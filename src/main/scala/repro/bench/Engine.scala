package repro.bench

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.baselines.{Cml, DeLn, LineNet, Qetch}
import repro.core._
import repro.vis.ExtractedChart

/** One scored (query, table) pair emitted by a distributed scoring pass. */
final case class Scored(qid: Int, tid: Long, score: Double)

/** Distributed scan + similarity-match dataflow (DESIGN.md §3).
  *
  * The repository is a cached `Dataset[BenchTable]`; every retrieval method
  * is a `mapPartitions` pass that encodes each table inside the executors
  * and scores it against the broadcast query representations, emitting
  * `(qid, tid, score)` rows that are collected and ranked per query. Index
  * strategies restrict a pass through a broadcast candidate map.
  */
object Engine {

  /** Run one scoring pass; returns per-query rankings (best first) and the
    * wall-clock milliseconds of the distributed job.
    */
  def pass(
      spark: SparkSession,
      tables: Dataset[BenchTable],
      f: BenchTable => Iterator[Scored]
  ): (Map[Int, Array[Long]], Long) = {
    val sp = spark
    import sp.implicits._
    val t0   = System.nanoTime()
    val rows = tables.mapPartitions(_.flatMap(f)).collect()
    val ms   = (System.nanoTime() - t0) / 1000000L
    val ranked = rows
      .groupBy(_.qid)
      .map { case (q, arr) =>
        q -> arr.sortBy(s => (-s.score, s.tid)).map(_.tid)
      }
    (ranked, ms)
  }

  private def allowed(restrict: Map[Int, Set[Long]], qid: Int, tid: Long): Boolean =
    restrict.isEmpty || restrict.get(qid).forall(_.contains(tid))

  /** FCM (any variant via `cfg`): encode table, score every query chart. */
  def fcmRank(
      spark: SparkSession,
      tables: Dataset[BenchTable],
      queries: Array[QueryPack],
      cfg: FcmConfig,
      restrict: Map[Int, Set[Long]] = Map.empty
  ): (Map[Int, Array[Long]], Long) = {
    val encoded = queries.map(q => (q.qid, ChartEncoder.encode(q.extracted, cfg)))
    val bq = spark.sparkContext.broadcast(encoded)
    val br = spark.sparkContext.broadcast(restrict)
    pass(
      spark,
      tables,
      t => {
        val wanted = bq.value.filter { case (qid, _) => allowed(br.value, qid, t.id) }
        if (wanted.isEmpty) Iterator.empty
        else {
          val emb = DatasetEncoder.encodeTable(t.id, t.cols, cfg)
          wanted.iterator.map { case (qid, chart) =>
            Scored(qid, t.id, Matcher.score(chart, emb, cfg))
          }
        }
      }
    )
  }

  /** CML baseline: global embeddings + cosine. */
  def cmlRank(
      spark: SparkSession,
      tables: Dataset[BenchTable],
      queries: Array[QueryPack]
  ): (Map[Int, Array[Long]], Long) = {
    val bq = spark.sparkContext.broadcast(queries.map(q => (q.qid, q.cmlVec)))
    pass(
      spark,
      tables,
      t => {
        val vec = Cml.tableVec(t.cols)
        bq.value.iterator.map { case (qid, qv) => Scored(qid, t.id, Cml.score(qv, vec)) }
      }
    )
  }

  /** Qetch* baseline: local sketch matching + bipartite aggregation. */
  def qetchRank(
      spark: SparkSession,
      tables: Dataset[BenchTable],
      queries: Array[QueryPack]
  ): (Map[Int, Array[Long]], Long) = {
    val bq = spark.sparkContext.broadcast(
      queries.map(q => (q.qid, q.extractedLines.map(Qetch.slopeProfile)))
    )
    pass(
      spark,
      tables,
      t => {
        val colProfiles = t.cols.map(Qetch.columnProfiles)
        bq.value.iterator.map { case (qid, lineProfiles) =>
          if (lineProfiles.isEmpty || colProfiles.isEmpty) Scored(qid, t.id, 0.0)
          else {
            val w = Array.tabulate(lineProfiles.length, colProfiles.length) { (i, j) =>
              Qetch.lineColumnRel(lineProfiles(i), colProfiles(j))
            }
            Scored(qid, t.id, Matching.maxWeight(w)._1 / lineProfiles.length)
          }
        }
      }
    )
  }

  /** DE-LN baseline: DeepEye recommends 5 charts per table, LineNet ranks. */
  def delnRank(
      spark: SparkSession,
      tables: Dataset[BenchTable],
      queries: Array[QueryPack],
      chartW: Int,
      chartH: Int
  ): (Map[Int, Array[Long]], Long) = {
    val bq = spark.sparkContext.broadcast(queries.map(q => (q.qid, q.lineNetVec)))
    pass(
      spark,
      tables,
      t => {
        val cand = DeLn.candidateVecs(t.cols, chartW, chartH)
        bq.value.iterator.map { case (qid, qv) => Scored(qid, t.id, DeLn.score(qv, cand)) }
      }
    )
  }

  /** Opt-LN upper bound: LineNet on the chart from the associated spec. */
  def optLnRank(
      spark: SparkSession,
      tables: Dataset[BenchTable],
      queries: Array[QueryPack],
      chartW: Int,
      chartH: Int
  ): (Map[Int, Array[Long]], Long) = {
    val bq = spark.sparkContext.broadcast(queries.map(q => (q.qid, q.lineNetVec)))
    pass(
      spark,
      tables,
      t => {
        val vec = DeLn.optVec(t.cols, t.specCols, chartW, chartH)
        bq.value.iterator.map { case (qid, qv) => Scored(qid, t.id, LineNet.sim(qv, vec)) }
      }
    )
  }

  /** Ground-truth `Rel(D, T)` pass (banded DTW + bipartite matching). */
  def gtRank(
      spark: SparkSession,
      tables: Dataset[BenchTable],
      queries: Array[QueryPack]
  ): (Map[Int, Array[Long]], Long) = {
    val bq = spark.sparkContext.broadcast(queries.map(q => (q.qid, q.underlyingPrepared)))
    pass(
      spark,
      tables,
      t => {
        val prepared = t.cols.map(Relevance.prep)
        bq.value.iterator.map { case (qid, d) =>
          Scored(qid, t.id, Relevance.relPrepared(d, prepared))
        }
      }
    )
  }

  /** Pure-Catalyst per-column statistics (min/max/sum) of the repository —
    * the interval-tree inputs — cross-checked against DuckDB in tests.
    */
  def columnStatsDF(spark: SparkSession, tables: Dataset[BenchTable]): DataFrame = {
    val sp = spark
    import sp.implicits._
    tables
      .select($"id", posexplode($"cols").as(Seq("colIdx", "values")))
      .select($"id", $"colIdx", explode($"values").as("v"))
      .groupBy($"id", $"colIdx")
      .agg(min($"v").as("mn"), max($"v").as("mx"), sum($"v").as("sm"))
  }
}
