package repro.core

import org.apache.spark.sql.Row

import repro.{Oracle, SparkSpec}
import repro.lake.{LakeTable, LakeCell}

class SketchAggregatorsSpec extends SparkSpec {

  private lazy val tables = Seq(
    LakeTable("a.csv", "", Seq("name", "qty"),
      Seq(Seq("x", "1"), Seq("y", "2"), Seq("y", "3"), Seq(null, "4"))),
    LakeTable("b.csv", "", Seq("name", "qty"),
      Seq(Seq("x", "10"), Seq("z", "20"))),
  )

  private lazy val cells = LakeTable.toCells(spark, tables).toDF()

  private lazy val colRows: Map[(String, Int), Row] =
    SketchAggregators.columnSketches(spark, cells).collect()
      .map(r => (r.getAs[String]("tableId"), r.getAs[Int]("colIdx")) -> r).toMap

  test("cell explosion has one row per cell") {
    assert(cells.count() == 4 * 2 + 2 * 2)
  }

  test("cell explosion preserves column names and row indices") {
    import spark.implicits._
    val a0 = cells.as[LakeCell].filter(c => c.tableId == "a.csv" && c.colIdx == 0).collect()
    assert(a0.map(_.colName).distinct.sameElements(Array("name")))
    assert(a0.map(_.rowIdx).sorted.sameElements(Array(0L, 1L, 2L, 3L)))
  }

  test("aggregated counts match the local sketcher") {
    for (t <- tables; (cs, i) <- TableSketcher.sketch(t).columns.zipWithIndex) {
      val r = colRows((t.id, i))
      assert(r.getAs[Long]("rowCount") == cs.rowCount, s"${t.id} col $i rowCount")
      assert(r.getAs[Long]("nullCount") == cs.nullCount, s"${t.id} col $i nullCount")
      assert(r.getAs[Long]("distinctCount") == cs.distinctCount, s"${t.id} col $i distinctCount")
    }
  }

  test("aggregated MinHash signatures match the local sketcher") {
    for (t <- tables; (cs, i) <- TableSketcher.sketch(t).columns.zipWithIndex) {
      val sig = colRows((t.id, i)).getAs[Seq[Long]]("valueMinHash").toArray
      assert(sig.sameElements(cs.valueMinHash), s"${t.id} col $i signature")
    }
  }

  test("aggregated numeric stats match the local sketcher") {
    for (t <- tables; (cs, i) <- TableSketcher.sketch(t).columns.zipWithIndex if cs.isNumeric) {
      val n = colRows((t.id, i)).getAs[Seq[Double]]("numStats").toArray
      assert(math.abs(n(0) - cs.numeric(0)) < 1e-9, "mean")
      assert(math.abs(n(1) - cs.numeric(1)) < 1e-9, "std")
      assert(n(2) == cs.numeric(2) && n(3) == cs.numeric(3), "min/max")
    }
  }

  test("content snapshots from the cell dataflow match the local sketcher") {
    val snaps = SketchAggregators.contentSnapshots(spark, cells).collect()
      .map(r => r.getAs[String]("tableId") -> r.getAs[Seq[Long]]("contentMinHash").toArray).toMap
    for (t <- tables) {
      assert(snaps(t.id).sameElements(TableSketcher.sketch(t).contentMinHash), t.id)
    }
  }

  test("count aggregations agree with the DuckDB oracle") {
    import spark.implicits._
    val counts = cells.groupBy($"tableId").count().select($"tableId", $"count" as "n")
    Oracle.assertEquivalent(
      counts,
      "SELECT tableId, count(*) AS n FROM cells GROUP BY tableId",
      "cells" -> cells)
  }

  test("null/distinct aggregations agree with the DuckDB oracle") {
    import spark.implicits._
    import org.apache.spark.sql.functions._
    val stats = cells
      .groupBy($"tableId", $"colIdx")
      .agg(
        sum(when($"value".isNull, 1).otherwise(0)) as "nulls",
        countDistinct($"value") as "distincts")
    Oracle.assertEquivalent(
      stats,
      """SELECT tableId, colIdx,
        |       sum(CASE WHEN value IS NULL THEN 1 ELSE 0 END) AS nulls,
        |       count(DISTINCT value) AS distincts
        |FROM cells GROUP BY tableId, colIdx""".stripMargin,
      "cells" -> cells)
  }

  test("parquet round trip preserves the cell lake") {
    val dir = java.nio.file.Files.createTempDirectory("lake").toString
    LakeTable.writeParquet(spark, tables, dir)
    val back = LakeTable.readCells(spark, dir)
    assert(back.count() == cells.count())
    val sig = SketchAggregators.columnSketches(spark, back).collect()
      .map(r => (r.getAs[String]("tableId"), r.getAs[Int]("colIdx")) -> r.getAs[Seq[Long]]("valueMinHash").toArray)
      .toMap
    assert(sig(("a.csv", 0)).sameElements(colRows(("a.csv", 0)).getAs[Seq[Long]]("valueMinHash")))
  }

  test("sketchAll distributes per-table sketching") {
    val sketches = TableSketcher.sketchAll(spark, tables).collect()
    assert(sketches.map(_.tableId).toSet == Set("a.csv", "b.csv"))
    val local = TableSketcher.sketch(tables.head)
    val dist  = sketches.find(_.tableId == "a.csv").get
    assert(dist.contentMinHash.sameElements(local.contentMinHash))
    assert(dist.columns.head.valueMinHash.sameElements(local.columns.head.valueMinHash))
  }
}
