package repro.core

import org.apache.spark.sql.{DataFrame, Encoder, Encoders, SparkSession}
import org.apache.spark.sql.catalyst.encoders.ExpressionEncoder
import org.apache.spark.sql.expressions.Aggregator
import org.apache.spark.sql.functions._

/** Distributed sketching over the long-format cell layout
  * (``tableId, colIdx, colName, rowIdx, value`` — see
  * [[repro.lake.LakeTable.toCells]]): the same sketches as
  * [[TableSketcher]], expressed as typed Spark ``Aggregator``s in a
  * ``groupBy(...).agg(...)`` dataflow so they run over a Parquet lake
  * without materializing tables on the driver.
  *
  * Unit tests assert this path agrees with the local [[TableSketcher]].
  */
object SketchAggregators {

  /** Aggregation buffer for a MinHash signature. */
  case class SigBuf(sig: Array[Long])

  /** MinHash over the *distinct* values of the aggregated column: the
    * per-slot min is insensitive to duplicates, so no explicit distinct
    * pass is needed — the hallmark MinHash property.
    */
  class MinHashAgg(k: Int) extends Aggregator[String, SigBuf, Array[Long]] {
    private val mh = new MinHash(k)
    def zero: SigBuf = SigBuf(Array.fill(k)(MinHash.Empty))
    def reduce(b: SigBuf, v: String): SigBuf = {
      if (v != null) {
        val s = mh.signature(Seq(v))
        var i = 0
        while (i < k) { if (s(i) < b.sig(i)) b.sig(i) = s(i); i += 1 }
      }
      b
    }
    def merge(a: SigBuf, b: SigBuf): SigBuf = {
      var i = 0
      while (i < k) { if (b.sig(i) < a.sig(i)) a.sig(i) = b.sig(i); i += 1 }
      a
    }
    def finish(b: SigBuf): Array[Long] = b.sig
    def bufferEncoder: Encoder[SigBuf] = Encoders.product[SigBuf]
    def outputEncoder: Encoder[Array[Long]] = ExpressionEncoder[Array[Long]]()
  }

  /** Numeric-stat buffer (count/sum/sumSq/min/max over parsed doubles). */
  case class NumBuf(n: Long, sum: Double, sumSq: Double, mn: Double, mx: Double)

  /** Streaming moments + extrema over cells that parse as doubles. */
  class NumStatsAgg extends Aggregator[String, NumBuf, Array[Double]] {
    def zero: NumBuf = NumBuf(0L, 0.0, 0.0, Double.MaxValue, Double.MinValue)
    def reduce(b: NumBuf, v: String): NumBuf =
      TypeInference.parseDouble(v) match {
        case Some(d) => NumBuf(b.n + 1, b.sum + d, b.sumSq + d * d,
                               math.min(b.mn, d), math.max(b.mx, d))
        case None => b
      }
    def merge(a: NumBuf, b: NumBuf): NumBuf =
      NumBuf(a.n + b.n, a.sum + b.sum, a.sumSq + b.sumSq,
             math.min(a.mn, b.mn), math.max(a.mx, b.mx))
    def finish(b: NumBuf): Array[Double] =
      if (b.n == 0) Array(Double.NaN, Double.NaN, Double.NaN, Double.NaN)
      else {
        val mean = b.sum / b.n
        val varr = math.max(0.0, b.sumSq / b.n - mean * mean)
        Array(mean, math.sqrt(varr), b.mn, b.mx)
      }
    def bufferEncoder: Encoder[NumBuf] = Encoders.product[NumBuf]
    def outputEncoder: Encoder[Array[Double]] = ExpressionEncoder[Array[Double]]()
  }

  /** Per-column sketch stats over a cell DataFrame: one row per
    * (tableId, colIdx) with counts, minhash signature and numeric moments.
    */
  def columnSketches(spark: SparkSession, cells: DataFrame, k: Int = MinHash.DefaultK): DataFrame = {
    val mhAgg  = udaf(new MinHashAgg(k))
    val numAgg = udaf(new NumStatsAgg)
    cells
      .groupBy(col("tableId"), col("colIdx"), col("colName"))
      .agg(
        count(lit(1)) as "rowCount",
        sum(when(col("value").isNull || trim(col("value")) === "", 1).otherwise(0)) as "nullCount",
        countDistinct(when(col("value").isNotNull && trim(col("value")) =!= "", col("value"))) as "distinctCount",
        avg(when(col("value").isNotNull && trim(col("value")) =!= "", length(col("value")))) as "avgWidth",
        mhAgg(col("value")) as "valueMinHash",
        numAgg(col("value")) as "numStats",
      )
  }

  /** Table-level content snapshot over a cell DataFrame: rows are
    * reassembled by (tableId, rowIdx) ordering cells by colIdx, then each
    * row-string feeds a MinHash — the distributed version of the paper's
    * content snapshot.
    */
  def contentSnapshots(spark: SparkSession, cells: DataFrame, k: Int = MinHash.DefaultK): DataFrame = {
    val mhAgg = udaf(new MinHashAgg(k))
    val rows = cells
      .groupBy(col("tableId"), col("rowIdx"))
      .agg(concat_ws(" ",
        sort_array(collect_list(struct(col("colIdx") as "i", coalesce(col("value"), lit("")) as "v"))
        ).getField("v")) as "rowString")
    rows.groupBy(col("tableId")).agg(mhAgg(col("rowString")) as "contentMinHash")
  }
}
