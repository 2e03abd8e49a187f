package repro.lakebench

import repro.{Oracle, SparkSpec}
import repro.lake.LakeTable

class StatsSpec extends SparkSpec {

  private lazy val bench = {
    val t1 = LakeTable("x.csv", "", Seq("s", "i"), Seq(Seq("a", "1"), Seq("b", "2")))
    val t2 = LakeTable("y.csv", "", Seq("f", "d", "s2"),
      Seq(Seq("1.5", "2020-01-01", "p"), Seq("2.5", "2020-02-01", "q")))
    Benchmark("Tiny", BinaryTask, Map(t1.id -> t1, t2.id -> t2),
      Seq(PairExample("x.csv", "y.csv", Array(0.0))), Seq.empty, Seq.empty)
  }

  test("meta infers per-table type counts") {
    val m = Stats.meta("Tiny", bench.tables("y.csv"))
    assert(m.rows == 2 && m.cols == 3)
    assert(m.nFloat == 1 && m.nDate == 1 && m.nString == 1 && m.nInt == 0)
  }

  test("aggregate computes Table 1 style numbers") {
    val row = Stats.aggregate(spark, Seq(bench)).collect().head
    assert(row.getAs[Long]("num_tables") == 2)
    assert(math.abs(row.getAs[Double]("avg_rows") - 2.0) < 1e-9)
    assert(math.abs(row.getAs[Double]("avg_cols") - 2.5) < 1e-9)
    // 5 columns total: 2 string, 1 int, 1 float, 1 date
    assert(math.abs(row.getAs[Double]("pct_string") - 40.0) < 1e-9)
    assert(math.abs(row.getAs[Double]("pct_int") - 20.0) < 1e-9)
  }

  test("aggregation agrees with the DuckDB oracle") {
    import spark.implicits._
    val metas = bench.tables.values.map(t => Stats.meta("Tiny", t)).toSeq
    val df = spark.createDataset(metas).toDF()
    import org.apache.spark.sql.functions._
    val agg = df.groupBy($"benchmark").agg(
      count(lit(1)) as "n", avg($"rows") as "avg_rows", sum($"nString") as "strings")
    Oracle.assertEquivalent(
      agg,
      "SELECT benchmark, count(*) AS n, avg(CAST(rows AS DOUBLE)) AS avg_rows, " +
        "sum(CAST(nString AS BIGINT)) AS strings FROM metas GROUP BY benchmark",
      "metas" -> df)
    val _ = agg
  }

  test("table1Row renders a single formatted line") {
    val line = Stats.table1Row(spark, bench)
    assert(line.startsWith("Tiny"))
    assert(line.split('|').length == 11)
  }
}
