package repro.search

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.core.{MinHash, TableSketch}
import repro.lake.LakeTable
import repro.lakebench.WikiLake

/** Join search over the Wiki lake (§6.3.1, Fig. 8): given a query table's
  * entity column, retrieve lake tables that are *sensibly* joinable —
  * same ground-truth concept with entity overlap — not merely
  * value-overlapping.
  *
  * Methods:
  *  - TabSketchFM: nearest-neighbor join over contextual column embeddings
  *    (sketches + value embedding), computed as a Spark DataFrame
  *    cross-join + window ranking over Parquet-persisted embeddings.
  *  - LSHForest-lite: MinHash band candidates ranked by estimated Jaccard.
  *  - JOSIE-lite: exact value-overlap ranking (set containment search).
  *  - EmbedJoin: value-embedding cosine only (WarpGate stand-in).
  */
object JoinSearch {

  case class ColumnEmb(tableId: String, colIdx: Int, emb: Array[Double])

  /** Build, persist to Parquet, and reload the embedding table — search
    * then runs as a DataFrame self-join over the Parquet data.
    */
  def embeddingsDf(spark: SparkSession, sketches: Map[String, TableSketch],
                   tables: Map[String, LakeTable], path: String): DataFrame = {
    import spark.implicits._
    val rows = repro.models.Parallel.map(sketches.values.toSeq) { s =>
      val t   = tables(s.tableId)
      val ctx = Embeddings.tableContext(s)
      s.columns.map(c => ColumnEmb(s.tableId, c.position,
        Embeddings.column(c, t.column(c.position).filter(_ != null), ctx)))
    }.flatten
    spark.createDataset(rows).write.mode("overwrite").parquet(path)
    spark.read.parquet(path)
  }

  private val dot = udf { (a: Seq[Double], b: Seq[Double]) =>
    var s = 0.0; var i = 0
    val n = math.min(a.length, b.length)
    while (i < n) { s += a(i) * b(i); i += 1 }
    s
  }

  /** Top-k joinable tables per query (queries are (tableId, colIdx) of the
    * entity columns): NN join of query embeddings against all lake column
    * embeddings, max-scored per candidate table, ranked by window.
    */
  def searchEmbeddings(spark: SparkSession, emb: DataFrame,
                       queries: Seq[(String, Int)], k: Int): Map[String, Seq[String]] = {
    import spark.implicits._
    val queryDf = queries.toDF("qTable", "qCol")
    val q = emb.join(queryDf, emb("tableId") === queryDf("qTable") && emb("colIdx") === queryDf("qCol"))
      .select($"qTable", $"emb" as "qEmb")
    val scored = q.crossJoin(emb.select($"tableId" as "cTable", $"emb" as "cEmb"))
      .where($"qTable" =!= $"cTable")
      .withColumn("score", dot($"qEmb", $"cEmb"))
      .groupBy($"qTable", $"cTable").agg(max($"score") as "score")
    val ranked = scored
      .withColumn("rank", row_number().over(Window.partitionBy($"qTable").orderBy(desc("score"), asc("cTable"))))
      .where($"rank" <= k)
    ranked.collect()
      .groupBy(_.getAs[String]("qTable"))
      .view.mapValues(_.sortBy(_.getAs[Int]("rank")).map(_.getAs[String]("cTable")).toSeq)
      .toMap
  }

  /** JOSIE-lite: rank candidate tables by exact max value overlap of any
    * column with the query column (overlap set similarity search).
    */
  def searchJosie(tables: Map[String, LakeTable], queries: Seq[(String, Int)], k: Int): Map[String, Seq[String]] = {
    val colSets: Map[String, Seq[Set[String]]] =
      tables.map { case (id, t) => id -> t.columnNames.indices.map(i => t.column(i).filter(_ != null).toSet) }
    queries.map { case (qt, qc) =>
      val qSet = colSets(qt)(qc)
      val ranked = tables.keys.filter(_ != qt).map { cand =>
        val best = colSets(cand).map(s => s.intersect(qSet).size).max
        (cand, best)
      }.toSeq.sortBy { case (id, s) => (-s, id) }
      qt -> ranked.takeWhile(_._2 > 0).take(k).map(_._1)
    }.toMap
  }

  /** LSHForest-lite: candidates sharing a MinHash band, ranked by the
    * estimated Jaccard of the best-matching column.
    */
  def searchLsh(sketches: Map[String, TableSketch], queries: Seq[(String, Int)], k: Int,
                rowsPerBand: Int = 4): Map[String, Seq[String]] = {
    val index: Map[Long, Seq[(String, Int)]] =
      sketches.values.flatMap { s =>
        s.columns.flatMap(c => MinHash.bandKeys(c.valueMinHash, rowsPerBand).map(b => b -> (s.tableId, c.position)))
      }.toSeq.groupBy(_._1).view.mapValues(_.map(_._2)).toMap
    queries.map { case (qt, qc) =>
      val qSig = sketches(qt).columns(qc).valueMinHash
      val cands = MinHash.bandKeys(qSig, rowsPerBand).flatMap(index.getOrElse(_, Seq.empty))
        .filter(_._1 != qt).distinct
      val ranked = cands.map { case (ct, cc) =>
        (ct, MinHash.jaccard(qSig, sketches(ct).columns(cc).valueMinHash))
      }.groupBy(_._1).view.mapValues(_.map(_._2).max).toSeq
        .sortBy { case (id, j) => (-j, id) }
      qt -> ranked.take(k).map(_._1)
    }.toMap
  }

  /** EmbedJoin (WarpGate stand-in): value-embedding cosine only. */
  def searchEmbedJoin(tables: Map[String, LakeTable], queries: Seq[(String, Int)], k: Int): Map[String, Seq[String]] = {
    val embs: Map[String, Seq[Array[Double]]] = tables.map { case (id, t) =>
      id -> t.columnNames.indices.map { i =>
        Embeddings.valueEmbedder.embed(
          t.column(i).filter(_ != null).take(100).flatMap(repro.core.Tokenizer.tokenize))
      }
    }
    queries.map { case (qt, qc) =>
      val q = embs(qt)(qc)
      val ranked = tables.keys.filter(_ != qt).map { cand =>
        (cand, embs(cand).map(e => Embeddings.cosine(q, e)).max)
      }.toSeq.sortBy { case (id, c) => (-c, id) }
      qt -> ranked.take(k).map(_._1)
    }.toMap
  }

  /** Ground truth: tables of the same concept with entity overlap. */
  def relevant(lake: WikiLake.Lake, queryTable: String): Set[String] = {
    val byId = lake.tables.map(t => t.table.id -> t).toMap
    val q = byId(queryTable)
    lake.tables.filter(t => t.table.id != queryTable && t.classIdx == q.classIdx &&
                            t.entityIdxs.intersect(q.entityIdxs).nonEmpty)
      .map(_.table.id).toSet
  }
}
