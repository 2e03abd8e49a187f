package repro.lakebench

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.TypeInference
import repro.lake.LakeTable

/** Table 1 statistics: benchmark cardinalities and the column data-type
  * distribution, computed as a Spark aggregation over per-table metadata
  * (type inference runs inside the distributed map, as sketching does).
  */
object Stats {

  case class TableMeta(benchmark: String, tableId: String, rows: Long, cols: Long,
                       nString: Long, nInt: Long, nFloat: Long, nDate: Long)

  def meta(benchmark: String, t: LakeTable): TableMeta = {
    val types = t.columnNames.indices.map(i => TypeInference.infer(t.column(i)))
    TableMeta(benchmark, t.id, t.numRows.toLong, t.numCols.toLong,
      types.count(_ == TypeInference.StringT).toLong,
      types.count(_ == TypeInference.IntT).toLong,
      types.count(_ == TypeInference.FloatT).toLong,
      types.count(_ == TypeInference.DateT).toLong)
  }

  /** One aggregated row per benchmark over its table corpus. */
  def aggregate(spark: SparkSession, benchmarks: Seq[Benchmark]): DataFrame = {
    import spark.implicits._
    val metas = benchmarks.flatMap(b => b.tables.values.map(t => (b.name, t)))
    val ds    = spark.createDataset(metas).map { case (n, t) => meta(n, t) }
    ds.groupBy($"benchmark").agg(
      count(lit(1))                 as "num_tables",
      round(avg($"rows"), 2)        as "avg_rows",
      round(avg($"cols"), 2)        as "avg_cols",
      round(sum($"nString") * lit(100.0) / sum($"cols"), 2) as "pct_string",
      round(sum($"nInt")    * lit(100.0) / sum($"cols"), 2) as "pct_int",
      round(sum($"nFloat")  * lit(100.0) / sum($"cols"), 2) as "pct_float",
      round(sum($"nDate")   * lit(100.0) / sum($"cols"), 2) as "pct_date",
    )
  }

  /** Formatted Table 1 row for one benchmark (pair counts from splits). */
  def table1Row(spark: SparkSession, b: Benchmark): String = {
    val agg = aggregate(spark, Seq(b)).collect().head
    f"${b.name}%-17s | ${agg.getAs[Long]("num_tables")}%8d | ${agg.getAs[Double]("avg_rows")}%9.2f | " +
      f"${agg.getAs[Double]("avg_cols")}%8.2f | ${b.train.size}%6d | ${b.test.size}%5d | ${b.valid.size}%5d | " +
      f"${agg.getAs[Double]("pct_string")}%6.2f | ${agg.getAs[Double]("pct_int")}%5.2f | " +
      f"${agg.getAs[Double]("pct_float")}%5.2f | ${agg.getAs[Double]("pct_date")}%5.2f"
  }
}
