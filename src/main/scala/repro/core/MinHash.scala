package repro.core

import scala.util.hashing.MurmurHash3

/** MinHash signatures — the repo's substitute for the datasketch library
  * used by the paper (§3, sketch 2 and the content snapshot).
  *
  * A signature is ``k`` slots; slot ``i`` holds the minimum of hash
  * function ``h_i`` over the element set. Hash ``h_i`` is murmur3 with a
  * per-slot seed, widened to a positive Long. Signatures of an empty set
  * are all ``MinHash.Empty`` and estimate 0 similarity against anything.
  */
final class MinHash(val k: Int) extends Serializable {
  require(k > 0, s"k must be positive, got $k")

  private def h(elem: String, i: Int): Long =
    (MurmurHash3.stringHash(elem, 0x9747b28c + i).toLong & 0xffffffffL)

  /** Signature of a set of string elements. */
  def signature(elems: Iterable[String]): Array[Long] = {
    val sig = Array.fill(k)(MinHash.Empty)
    val it  = elems.iterator
    while (it.hasNext) {
      val e = it.next()
      if (e != null) {
        var i = 0
        while (i < k) {
          val v = h(e, i)
          if (v < sig(i)) sig(i) = v
          i += 1
        }
      }
    }
    sig
  }
}

object MinHash {
  /** Slot value of the empty-set signature. */
  val Empty: Long = Long.MaxValue

  /** Default signature width used throughout the repro (paper uses
    * datasketch's default 128; 64 keeps sketches small while leaving the
    * estimator noise that bounds R2 on the Wiki join tasks, §6.2).
    */
  val DefaultK = 64

  def apply(k: Int = DefaultK): MinHash = new MinHash(k)

  def isEmpty(sig: Array[Long]): Boolean = sig.length == 0 || sig(0) == Empty

  /** Unbiased Jaccard estimate: fraction of matching slots. */
  def jaccard(a: Array[Long], b: Array[Long]): Double = {
    if (isEmpty(a) || isEmpty(b)) return 0.0
    require(a.length == b.length, s"signature width mismatch ${a.length} vs ${b.length}")
    var same = 0
    var i = 0
    while (i < a.length) { if (a(i) == b(i)) same += 1; i += 1 }
    same.toDouble / a.length
  }

  /** Containment |A∩B|/|A| estimated from the Jaccard estimate and the
    * (exact) distinct counts of the two sets: J = |A∩B| / (|A|+|B|-|A∩B|)
    * implies |A∩B| = J(|A|+|B|)/(1+J).
    */
  def containment(a: Array[Long], b: Array[Long], sizeA: Long, sizeB: Long): Double = {
    if (sizeA <= 0) return 0.0
    val j = jaccard(a, b)
    val inter = j * (sizeA + sizeB) / (1.0 + j)
    math.min(1.0, inter / sizeA)
  }

  /** LSH band keys: hash of each band of ``rowsPerBand`` slots; two sets
    * sharing any band key are candidate neighbours (LSHForest-lite).
    */
  def bandKeys(sig: Array[Long], rowsPerBand: Int): Seq[Long] = {
    if (isEmpty(sig)) return Seq.empty
    sig.grouped(rowsPerBand).zipWithIndex.map { case (band, bi) =>
      var acc = 1125899906842597L * (bi + 1)
      band.foreach(v => acc = acc * 31 + v)
      acc
    }.toSeq
  }
}
