package repro.lakebench

/** Lazily-built full-size LakeBench instances, shared by the bench suites
  * and the spark-submit jobs (one generation per JVM; the three Wiki
  * benchmarks share one lake so sketches/views are computed once).
  *
  * Cardinalities are scaled to laptop Spark (paper-scale counts are
  * recorded next to ours in EXPERIMENTS.md).
  */
object LakeBenchSuite {

  lazy val wikiLake: WikiLake.Lake = WikiLake.generate(seed = 21)

  lazy val tusSantos: Benchmark       = TusSantos.generate()
  lazy val wikiUnion: Benchmark       = WikiUnion.generate(wikiLake)
  lazy val ecbUnion: Benchmark        = EcbUnion.generate()
  lazy val wikiJaccard: Benchmark     = WikiJoin.generateJaccard(wikiLake)
  lazy val wikiContainment: Benchmark = WikiJoin.generateContainment(wikiLake)
  lazy val spiderOpenData: Benchmark  = SpiderOpenData.generate()
  lazy val ecbJoin: Benchmark         = EcbJoin.generate()
  lazy val ckanSubset: Benchmark      = CkanSubset.generate()

  /** Table 1 / Table 2 ordering (paper row order). */
  lazy val all: Seq[Benchmark] = Seq(
    tusSantos, wikiUnion, ecbUnion, wikiJaccard, wikiContainment,
    spiderOpenData, ecbJoin, ckanSubset)

  /** Tables 3–4 exclude TUS-SANTOS (solvable from headers alone, §6.2). */
  lazy val ablationSet: Seq[Benchmark] = all.filterNot(_.name == "TUS-SANTOS")
}
