package repro.index

import repro.core.{ChartEmb, Features}

/** Column-level statistics + embedding used to build the hybrid index. */
final case class ColumnKey(
    tableId: Long,
    colIdx: Int,
    min: Double,
    max: Double,
    sum: Double,
    pooled: Array[Double]
) extends Serializable

/** The four query-processing strategies of Table VIII. */
sealed trait IndexStrategy extends Serializable
object IndexStrategy {
  case object NoIndex      extends IndexStrategy
  case object IntervalOnly extends IndexStrategy
  case object LshOnly      extends IndexStrategy
  case object Hybrid       extends IndexStrategy
  val all: Seq[IndexStrategy] = Seq(NoIndex, IntervalOnly, LshOnly, Hybrid)
  def name(s: IndexStrategy): String = s match {
    case NoIndex      => "No Index"
    case IntervalOnly => "Interval Tree"
    case LshOnly      => "LSH"
    case Hybrid       => "Hybrid"
  }
}

/** Hybrid indexing strategy (paper Sec. VI-A): an interval tree over the
  * per-column feasible ranges [min(C), sum(C)] (no false negatives) and an
  * LSH table over pooled column embeddings (aggressive pruning, possible
  * recall loss); the hybrid strategy intersects the two candidate sets.
  */
final class HybridIndex(
    tree: IntervalTree,
    buckets: Map[Int, Set[Long]],
    lsh: Lsh,
    allIds: Set[Long],
    flips: Int
) extends Serializable {

  /** S1: datasets with at least one column overlapping the chart y-range. */
  def intervalCandidates(yLo: Double, yHi: Double): Set[Long] = tree.query(yLo, yHi)

  /** S2: datasets colliding with any query line's code (multi-probe). */
  def lshCandidates(lineVecs: Seq[Array[Double]]): Set[Long] =
    lineVecs.iterator.flatMap { v =>
      lsh.probes(lsh.code(v), flips).iterator.flatMap(c => buckets.getOrElse(c, Set.empty))
    }.toSet

  /** Candidate datasets for a query chart under a strategy. */
  def candidates(strategy: IndexStrategy, chart: ChartEmb): Set[Long] = {
    lazy val s1 = intervalCandidates(chart.yLo, chart.yHi)
    lazy val s2 = lshCandidates(chart.lines.map(_.pooled).toSeq)
    strategy match {
      case IndexStrategy.NoIndex      => allIds
      case IndexStrategy.IntervalOnly => s1
      case IndexStrategy.LshOnly      => s2
      case IndexStrategy.Hybrid       => s1.intersect(s2)
    }
  }
}

object HybridIndex {

  /** Build both structures from the repository's column keys. The interval
    * for a column is [min(C), sum(C)] as in the paper, widened to handle
    * negative-valued columns whose sum can undercut the minimum.
    */
  def build(keys: Seq[ColumnKey], bits: Int = 10, flips: Int = 1, seed: Long = 11L): HybridIndex = {
    require(keys.nonEmpty, "cannot index an empty repository")
    val intervals = keys.map { k =>
      Interval(math.min(k.min, k.sum), math.max(k.max, k.sum), k.tableId)
    }
    val dim = Features.Dim
    val lsh = new Lsh(dim, bits, seed)
    val buckets = keys
      .groupBy(k => lsh.code(k.pooled))
      .map { case (c, ks) => c -> ks.map(_.tableId).toSet }
    new HybridIndex(IntervalTree.build(intervals), buckets, lsh, keys.map(_.tableId).toSet, flips)
  }
}
