package repro.report

import org.apache.spark.sql.SparkSession

import repro.lakebench.{Benchmark, LakeBenchSuite, Stats}
import repro.models.{Baselines, PairFeaturizer, Runner, SketchFeaturizer, SketchMask}

/** Generators for the paper's evaluation tables. Each returns printable
  * lines (and structured cells for assertions); bench suites and the
  * spark-submit jobs share these.
  */
object Reports {

  case class Cell(bench: String, model: String, metric: String, mean: Double, std: Double)

  // ---------------------------------------------------------------- Table 1

  def table1(spark: SparkSession): Seq[String] = {
    val header =
      f"${"Benchmark"}%-17s | ${"#Tables"}%8s | ${"AvgRows"}%9s | ${"AvgCols"}%8s | ${"Train"}%6s | ${"Test"}%5s | ${"Valid"}%5s | ${"Str%"}%6s | ${"Int%"}%5s | ${"Flt%"}%5s | ${"Date%"}%5s"
    header +: LakeBenchSuite.all.map(b => Stats.table1Row(spark, b))
  }

  // ---------------------------------------------------------------- Table 2

  def table2(spark: SparkSession, seeds: Seq[Long] = Seq(0L, 1L, 2L, 3L, 4L),
             roster: Seq[PairFeaturizer] = Baselines.table2Roster,
             benches: Seq[Benchmark] = LakeBenchSuite.all): (Seq[String], Seq[Cell]) = {
    val cells = for (b <- benches; m <- roster) yield {
      val (mean, std) = Runner.run(spark, m, b, seeds)
      Cell(b.name, m.name, Runner.metricName(b.task), mean, std)
    }
    val lines = render(cells, roster.map(_.name))
    (lines, cells)
  }

  private def render(cells: Seq[Cell], models: Seq[String]): Seq[String] = {
    val benches = cells.map(c => (c.bench, c.metric)).distinct
    val header = f"${"Task"}%-22s" + models.map(m => f" | $m%-18s").mkString
    header +: benches.map { case (b, metric) =>
      f"$b%-17s ($metric%s)" + models.map { m =>
        val c = cells.find(x => x.bench == b && x.model == m).get
        f" | ${c.mean}%5.2f ± ${c.std}%4.2f      "
      }.mkString
    }
  }

  // ------------------------------------------------------------ Tables 3, 4

  /** Single-sketch ablation (Table 3): header tokens + exactly one sketch
    * family, seed 0, over the seven non-TUS tasks.
    */
  def table3(spark: SparkSession): (Seq[String], Seq[Cell]) = {
    val roster = Seq(
      SketchFeaturizer(SketchMask.onlyMinhash, "MinHash only"),
      SketchFeaturizer(SketchMask.onlyNumerical, "Numerical only"),
      SketchFeaturizer(SketchMask.onlyContent, "Content only"),
      SketchFeaturizer(SketchMask.all, "TabSketchFM (all)"),
    )
    table2(spark, seeds = Seq(0L), roster = roster, benches = LakeBenchSuite.ablationSet)
  }

  /** Leave-one-sketch-out ablation (Table 4). */
  def table4(spark: SparkSession): (Seq[String], Seq[Cell]) = {
    val roster = Seq(
      SketchFeaturizer(SketchMask.noMinhash, "No MinHash"),
      SketchFeaturizer(SketchMask.noNumerical, "No Numerical"),
      SketchFeaturizer(SketchMask.noContent, "No Content"),
      SketchFeaturizer(SketchMask.all, "TabSketchFM (all)"),
    )
    table2(spark, seeds = Seq(0L), roster = roster, benches = LakeBenchSuite.ablationSet)
  }

  def cellOf(cells: Seq[Cell], bench: String, model: String): Double =
    cells.find(c => c.bench == bench && c.model == model).get.mean
}
