package repro.eval

/** Retrieval effectiveness metrics (paper Sec. VII-B): prec@k and ndcg@k
  * with binary relevance (the benchmark defines exactly |rel| = k relevant
  * datasets per query).
  */
object Metrics {

  /** Fraction of the top-k that is relevant. */
  def precAtK(ranked: Seq[Long], relevant: Set[Long], k: Int): Double = {
    if (k <= 0) return 0.0
    ranked.take(k).count(relevant.contains).toDouble / k
  }

  /** Binary-gain NDCG@k; ideal DCG assumes min(k, |relevant|) hits up top. */
  def ndcgAtK(ranked: Seq[Long], relevant: Set[Long], k: Int): Double = {
    if (k <= 0 || relevant.isEmpty) return 0.0
    var dcg = 0.0
    ranked.take(k).zipWithIndex.foreach { case (id, idx) =>
      if (relevant.contains(id)) dcg += 1.0 / (math.log(idx + 2) / math.log(2))
    }
    var idcg = 0.0
    var i = 0
    val ideal = math.min(k, relevant.size)
    while (i < ideal) {
      idcg += 1.0 / (math.log(i + 2) / math.log(2))
      i += 1
    }
    if (idcg == 0) 0.0 else dcg / idcg
  }

  /** Mean of a metric over queries. */
  def mean(xs: Seq[Double]): Double = if (xs.isEmpty) 0.0 else xs.sum / xs.length
}
