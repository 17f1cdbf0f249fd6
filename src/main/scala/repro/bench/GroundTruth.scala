package repro.bench

import org.apache.spark.sql.{Dataset, SparkSession}

/** Ground-truth construction (paper Sec. VII-A): for every query, the
  * top-k repository tables by `Rel(D, T)` form the relevant set. Computed
  * with the distributed DTW + bipartite-matching pass of `Engine.gtRank`.
  */
object GroundTruth {

  /** Relevant table ids (ordered, best first) per query id. */
  def topK(
      spark: SparkSession,
      tables: Dataset[BenchTable],
      queries: Array[QueryPack],
      k: Int
  ): Map[Int, Array[Long]] =
    Engine.gtRank(spark, tables, queries)._1.map { case (qid, ranked) => qid -> ranked.take(k) }
}
