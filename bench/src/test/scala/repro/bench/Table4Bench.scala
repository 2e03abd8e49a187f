package repro.bench

import repro.SparkSpec
import repro.report.Reports

/** Regenerates Table 4: TabSketchFM with one sketch family removed
  * (seed 0, seven non-TUS tasks). The paper's headline: removing MinHash
  * hurts the join tasks most.
  */
class Table4Bench extends SparkSpec {

  test("Table 4: leave-one-sketch-out ablation") {
    val (lines, cells) = Reports.table4(spark)
    println("==== Table 4: removing one sketch (this repro, seed 0) ====")
    lines.foreach(println)

    def m(b: String, model: String) = Reports.cellOf(cells, b, model)

    // Removing MinHash degrades the join tasks the most (paper: 0.425/0.358
    // vs full 0.577/0.586; removing the other sketches barely moves them).
    for (task <- Seq("Wiki Jaccard", "Wiki Containment")) {
      val full = m(task, "TabSketchFM (all)")
      assert(m(task, "No MinHash") < full - 0.05, s"$task must suffer without minhash")
      assert(m(task, "No Numerical") > m(task, "No MinHash"), s"$task: minhash is the critical sketch")
    }

    // Subset survives the removal of the content snapshot (paper: 0.980 vs
    // 0.986; ours keeps the property with a wider margin to the full model).
    assert(m("CKAN Subset", "No Content") > 0.75)
  }
}
