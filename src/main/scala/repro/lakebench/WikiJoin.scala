package repro.lakebench

import scala.util.Random

import WikiLake.{Lake, WikiTable}

/** Wiki Jaccard and Wiki Containment regression benchmarks (§5.2.1–2):
  * table pairs scored by the exact Jaccard similarity (resp. minimum
  * containment ratio) of the ground-truth cell-entity mappings of their
  * entity columns. Cells hold (ambiguous) labels; the ground truth holds
  * entity indices — so value overlap is a noisy proxy of the target, as
  * in the paper's Wikidata lake.
  */
object WikiJoin {

  private def buildPairs(lake: Lake, seed: Long, nPairs: Int,
                         score: (WikiTable, WikiTable) => Double): Seq[PairExample] = {
    val rng     = new Random(seed)
    val byClass = lake.tables.groupBy(_.classIdx).view.mapValues(_.toVector).toMap
    val classes = byClass.keys.toVector.sorted
    val ts      = lake.tables.toVector

    val pairs = scala.collection.mutable.ArrayBuffer.empty[PairExample]
    val seen  = scala.collection.mutable.HashSet.empty[(String, String)]
    def add(a: WikiTable, b: WikiTable): Unit = {
      if (a.table.id == b.table.id) return
      val k = if (a.table.id < b.table.id) (a.table.id, b.table.id) else (b.table.id, a.table.id)
      if (seen.add(k)) pairs += PairExample(a.table.id, b.table.id, Array(score(a, b)))
    }

    var guard = 0
    while (pairs.size < nPairs && guard < nPairs * 50) {
      guard += 1
      if (pairs.size % 5 == 4) {
        // Cross-class pair: score 0 (disjoint entity spaces).
        val a = ts(rng.nextInt(ts.size))
        val bs = byClass(classes((classes.indexOf(a.classIdx) + 1 + rng.nextInt(classes.size - 1)) % classes.size))
        add(a, bs(rng.nextInt(bs.size)))
      } else {
        val c = classes(rng.nextInt(classes.size))
        val g = byClass(c)
        if (g.size >= 2) add(g(rng.nextInt(g.size)), g(rng.nextInt(g.size)))
      }
    }
    pairs.toSeq
  }

  def generateJaccard(lake: Lake, seed: Long = 41, nPairs: Int = 1700): Benchmark = {
    val pairs = buildPairs(lake, seed, nPairs, WikiLake.entityJaccard)
    val (tr, va, te) = Benchmark.split(pairs, seed)
    Benchmark("Wiki Jaccard", RegressionTask, lake.lakeTables, tr, va, te)
  }

  def generateContainment(lake: Lake, seed: Long = 43, nPairs: Int = 2100): Benchmark = {
    val pairs = buildPairs(lake, seed, nPairs, WikiLake.entityContainment)
    val (tr, va, te) = Benchmark.split(pairs, seed)
    Benchmark("Wiki Containment", RegressionTask, lake.lakeTables, tr, va, te)
  }
}
