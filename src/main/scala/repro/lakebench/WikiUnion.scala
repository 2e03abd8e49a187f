package repro.lakebench

import scala.util.Random

import WikiLake.{Lake, WikiTable}

/** Wiki Union binary classification (§5.1.2): positives are fully
  * unionable table pairs (same concept, same property set); negatives are
  * (a) same property set but different concept, and (b) same column count
  * but different property sets — exactly the paper's two negative kinds.
  *
  * Headers are cryptic (``colN``), so the benchmark is unsolvable from
  * headers alone — the reason Vanilla BERT sits at majority-class F1.
  */
object WikiUnion {

  def generate(lake: Lake, seed: Long = 31, nPairs: Int = 4200): Benchmark = {
    val rng = new Random(seed)
    val ts  = lake.tables.toVector

    val bySig      = ts.groupBy(_.schemaSig)
    val byClassSig = ts.groupBy(t => (t.classIdx, t.schemaSig))
    val byNCols    = ts.groupBy(_.schema.size)

    def pick[T](v: Vector[T]): T = v(rng.nextInt(v.size))

    val posGroups = byClassSig.values.filter(_.size >= 2).toVector
    // Signatures spanning >=2 classes -> negative kind (a) exists.
    val crossSigs = bySig.filter { case (_, g) => g.map(_.classIdx).distinct.size >= 2 }.values.toVector

    val pairs = scala.collection.mutable.ArrayBuffer.empty[PairExample]
    val seen  = scala.collection.mutable.HashSet.empty[(String, String)]
    def add(a: WikiTable, b: WikiTable, label: Double): Boolean = {
      if (a.table.id == b.table.id) return false
      val k = if (a.table.id < b.table.id) (a.table.id, b.table.id) else (b.table.id, a.table.id)
      if (seen.add(k)) { pairs += PairExample(a.table.id, b.table.id, Array(label)); true } else false
    }

    require(posGroups.nonEmpty, "wiki lake has no unionable group — corpus too small")
    // Every negative is anchored at the table of the positive generated
    // just before it, so schema size (the only thing cryptic headers can
    // reveal) is identically distributed across labels.
    var guard = 0
    var toggle = false
    while (pairs.size < nPairs && guard < nPairs * 50) {
      guard += 1
      val g = pick(posGroups)
      val a = pick(g)
      add(a, pick(g), 1.0)
      toggle = !toggle
      val crossPartners = bySig(a.schemaSig).filter(_.classIdx != a.classIdx)
      if (toggle && crossPartners.nonEmpty) {
        // negative (a): same schema set, different class
        add(a, pick(crossPartners), 0.0)
      } else {
        // negative (b): same #cols, different schema set
        val bs = byNCols(a.schema.size).filter(_.schemaSig != a.schemaSig)
        if (bs.nonEmpty) add(a, pick(bs), 0.0)
      }
    }
    val _ = crossSigs

    val (tr, va, te) = Benchmark.split(pairs.toSeq, seed)
    Benchmark("Wiki Union", BinaryTask, lake.lakeTables, tr, va, te)
  }
}
