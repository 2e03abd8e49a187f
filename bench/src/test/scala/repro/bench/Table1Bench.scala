package repro.bench

import repro.SparkSpec
import repro.lakebench.LakeBenchSuite
import repro.report.Reports

/** Regenerates Table 1 (LakeBench benchmark statistics) at this repro's
  * scaled-down cardinalities. Paper-scale numbers are recorded next to
  * these in EXPERIMENTS.md.
  */
class Table1Bench extends SparkSpec {

  test("Table 1: benchmark cardinalities and datatype distribution") {
    val lines = Reports.table1(spark)
    println("==== Table 1: LakeBench statistics (this repro) ====")
    lines.foreach(println)

    // The mix properties the paper calls out must hold at our scale too.
    val byName = LakeBenchSuite.all.map(b => b.name -> b).toMap
    assert(byName.size == 8, "all eight benchmarks generated")
    // Every benchmark has non-empty splits.
    LakeBenchSuite.all.foreach { b =>
      assert(b.train.nonEmpty && b.valid.nonEmpty && b.test.nonEmpty, s"${b.name} splits")
    }
    // Wiki tables are small with few columns; ECB tables are wide.
    val wiki = byName("Wiki Union").tables.values
    assert(wiki.map(_.numCols).sum.toDouble / wiki.size < 9.0)
    val ecb = byName("ECB Union").tables.values
    assert(ecb.map(_.numCols).sum.toDouble / ecb.size > 10.0)
  }
}
