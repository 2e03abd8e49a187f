package repro.bench

import repro.SparkSpec
import repro.report.Reports

/** Regenerates Table 3: TabSketchFM with header tokens + exactly one
  * sketch family per run (seed 0, seven non-TUS tasks). The paper's
  * headline: MinHash sketches carry the join tasks, numerical sketches
  * carry the subset task.
  */
class Table3Bench extends SparkSpec {

  test("Table 3: single-sketch ablation") {
    val (lines, cells) = Reports.table3(spark)
    println("==== Table 3: one sketch at a time (this repro, seed 0) ====")
    lines.foreach(println)

    def m(b: String, model: String) = Reports.cellOf(cells, b, model)

    // MinHash alone dominates the join tasks (paper: 0.537/0.628 vs numerical 0.318/0.252).
    for (task <- Seq("Wiki Jaccard", "Wiki Containment")) {
      assert(m(task, "MinHash only") > m(task, "Numerical only"),
        s"$task: minhash must beat numerical alone")
    }

    // Numerical sketches are the strongest single non-content sketch on
    // the subset task (paper: 0.984), well above MinHash (paper: 0.431).
    // Our feature model keeps the ordering though not the paper's margin —
    // see EXPERIMENTS.md for the cell-by-cell comparison.
    assert(m("CKAN Subset", "Numerical only") > 0.75, "numerical sketches drive CKAN Subset")
    assert(m("CKAN Subset", "MinHash only") < m("CKAN Subset", "Numerical only") - 0.1,
      "minhash alone must trail numerical on CKAN Subset")

    // The full model is never far below the best single sketch.
    for ((b, _) <- cells.map(c => (c.bench, c.metric)).distinct) {
      val best = Seq("MinHash only", "Numerical only", "Content only").map(m(b, _)).max
      assert(m(b, "TabSketchFM (all)") > best - 0.12, s"$b: full model collapsed vs $best")
    }
  }
}
