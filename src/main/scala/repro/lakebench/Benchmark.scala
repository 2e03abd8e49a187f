package repro.lakebench

import scala.util.Random

import repro.lake.LakeTable

/** LakeBench problem types (§5): binary classification, regression, and
  * multi-label classification (ECB Join).
  */
sealed trait TaskType
case object BinaryTask                              extends TaskType
case object RegressionTask                          extends TaskType
case class MultiLabelTask(labelNames: Seq[String])  extends TaskType

/** One labeled table pair. ``label`` has length 1 except for multi-label
  * tasks where it is one indicator per label name.
  */
case class PairExample(t1: String, t2: String, label: Array[Double])

/** A finetuning benchmark: the table corpus plus train/valid/test pairs. */
case class Benchmark(
    name: String,
    task: TaskType,
    tables: Map[String, LakeTable],
    train: Seq[PairExample],
    valid: Seq[PairExample],
    test: Seq[PairExample],
) {
  def allPairs: Seq[PairExample] = train ++ valid ++ test
}

object Benchmark {

  /** Deterministic shuffle + split into train/valid/test fractions that
    * mirror LakeBench's roughly 80/10/10 layout.
    */
  def split(pairs: Seq[PairExample], seed: Long,
            trainFrac: Double = 0.8, validFrac: Double = 0.1): (Seq[PairExample], Seq[PairExample], Seq[PairExample]) = {
    val rng      = new Random(seed)
    val shuffled = rng.shuffle(pairs.toVector)
    val nTrain   = (shuffled.size * trainFrac).toInt
    val nValid   = (shuffled.size * validFrac).toInt
    (shuffled.take(nTrain),
     shuffled.slice(nTrain, nTrain + nValid),
     shuffled.drop(nTrain + nValid))
  }

  /** Random lake-style table id, e.g. "QCXMIM62QXN0" (Fig. 4). */
  def tableId(rng: Random, len: Int = 12): String = {
    val chars = "ABCDEFGHIJKLMNOPQRSTUVWXYZ0123456789"
    (0 until len).map(_ => chars(rng.nextInt(chars.length))).mkString
  }
}
