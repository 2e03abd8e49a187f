package repro.lakebench

import scala.util.Random

/** ECB Union regression (§5.1.3): pairs of series tables from the same
  * dataset ranked by how many of the 12 dimensions differ (1..12). The
  * regression target is the normalized union plausibility
  * ``(12 - nDiff) / 11`` — 1.0 when a single dimension changed, 0.0 when
  * all twelve did.
  */
object EcbUnion {

  val NDims = 12

  def generate(seed: Long = 51, nDatasets: Int = 26, nPairs: Int = 2100): Benchmark = {
    val rng = new Random(seed)

    case class Entry(id: String, assignment: Map[String, String])

    val tables = scala.collection.mutable.LinkedHashMap.empty[String, repro.lake.LakeTable]
    val pairs  = scala.collection.mutable.ArrayBuffer.empty[PairExample]

    for (ds <- 0 until nDatasets) {
      val dims = rng.shuffle(EcbLake.Dimensions).take(NDims)
      val dimNames = dims.map(_._1)

      def randomAssignment(): Map[String, String] =
        dims.map { case (d, codes) => d -> codes(rng.nextInt(codes.size)) }.toMap

      val base = randomAssignment()
      val nObs = 1 + rng.nextInt(3)

      def mk(assign: Map[String, String]): Entry = {
        val id = s"ECB$ds." + Benchmark.tableId(rng, 8) + ".csv"
        tables(id) = EcbLake.seriesTable(id, dimNames, assign, 60 + rng.nextInt(90), nObs, rng)
        Entry(id, assign)
      }

      val baseEntry = mk(base)
      // For each nDiff in 1..12, two variants differing from base in
      // exactly nDiff dimensions -> a uniform spread of targets.
      val variants = for {
        d   <- 1 to NDims
        _   <- 0 until 2
      } yield {
        val changed = rng.shuffle(dims).take(d)
        val assign = base ++ changed.map { case (dim, codes) =>
          val cur  = base(dim)
          val alts = codes.filterNot(_ == cur)
          dim -> (if (alts.isEmpty) cur else alts(rng.nextInt(alts.size)))
        }.toMap
        mk(assign)
      }

      def nDiff(a: Map[String, String], b: Map[String, String]): Int =
        dimNames.count(d => a(d) != b(d))

      for (v <- variants) {
        val d = nDiff(baseEntry.assignment, v.assignment)
        if (d >= 1) pairs += PairExample(baseEntry.id, v.id, Array((NDims - d).toDouble / (NDims - 1)))
      }
      // Variant-variant pairs fill in intermediate diffs.
      val vv = rng.shuffle(variants.combinations(2).toVector).take(60)
      for (Seq(a, b) <- vv) {
        val d = nDiff(a.assignment, b.assignment)
        if (d >= 1) pairs += PairExample(a.id, b.id, Array((NDims - d).toDouble / (NDims - 1)))
      }
    }

    val sampled      = new Random(seed + 1).shuffle(pairs.toVector).take(nPairs)
    val (tr, va, te) = Benchmark.split(sampled, seed)
    Benchmark("ECB Union", RegressionTask, tables.toMap, tr, va, te)
  }
}
