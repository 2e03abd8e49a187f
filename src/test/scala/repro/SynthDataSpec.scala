package repro

import org.apache.spark.sql.functions._

/** Sanity + oracle checks over the provided TPC-H-lite generators: the
  * DuckDB oracle wiring is exercised on real aggregation/join queries so
  * downstream suites can trust ``Oracle.assertEquivalent``.
  */
class SynthDataSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val os = SynthData.orders(spark, sf = 0.001).cache()

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).agg(sum(col("l_orderkey")) as "s").collect().head.getLong(0)
    val b = SynthData.lineitem(spark, sf = 0.001).agg(sum(col("l_orderkey")) as "s").collect().head.getLong(0)
    assert(a == b)
  }

  test("lineitem aggregation matches DuckDB") {
    import spark.implicits._
    val q = li.groupBy($"l_returnflag")
      .agg(count(lit(1)) as "n", round(sum($"l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(
      q,
      "SELECT l_returnflag, count(*) AS n, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("lineitem-orders join count matches DuckDB") {
    import spark.implicits._
    val q = li.join(os, $"l_orderkey" === $"o_orderkey")
      .groupBy($"o_orderstatus").agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(
      q,
      "SELECT o_orderstatus, count(*) AS n FROM lineitem JOIN orders " +
        "ON lineitem.l_orderkey = orders.o_orderkey GROUP BY o_orderstatus",
      "lineitem" -> li, "orders" -> os)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(desc("count")).limit(1).collect().head.getLong(1)
      top.toDouble / 20000
    }
    assert(topShare(z) > 0.05, "zipf head key should dominate")
    assert(topShare(u) < 0.01, "uniform keys should not concentrate")
  }
}
