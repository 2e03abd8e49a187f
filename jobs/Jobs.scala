package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.report.{Reports, SearchReport}

/** spark-submit entrypoints, one per reproduced table/figure:
  *
  * {{{
  * spark-submit --class repro.jobs.Table1Job target/scala-2.13/repro_2.13-*.jar
  * }}}
  */
object Jobs {
  private[jobs] def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** Table 1: LakeBench statistics. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("tabsketchfm-table1")
    try Reports.table1(spark).foreach(println)
    finally spark.stop()
  }
}

/** Table 2: six models on eight tasks (5 seeds; pass a seed count to shrink). */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("tabsketchfm-table2")
    val seeds = (0L until args.headOption.map(_.toLong).getOrElse(5L)).toSeq
    try Reports.table2(spark, seeds)._1.foreach(println)
    finally spark.stop()
  }
}

/** Table 3: single-sketch ablation. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("tabsketchfm-table3")
    try Reports.table3(spark)._1.foreach(println)
    finally spark.stop()
  }
}

/** Table 4: leave-one-sketch-out ablation. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("tabsketchfm-table4")
    try Reports.table4(spark)._1.foreach(println)
    finally spark.stop()
  }
}

/** Figures 8–10 analogue: join and union search F1@k. */
object SearchJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("tabsketchfm-search")
    try {
      SearchReport.joinSearch(spark)._1.foreach(println)
      SearchReport.unionSearch(spark)._1.foreach(println)
    } finally spark.stop()
  }
}
