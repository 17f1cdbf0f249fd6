package repro.index

/** A closed interval tagged with the id of the dataset it indexes. */
final case class Interval(lo: Double, hi: Double, id: Long) extends Serializable {
  def overlaps(qLo: Double, qHi: Double): Boolean = lo <= qHi && hi >= qLo
}

/** Centered interval tree (paper Sec. VI-A): every column of every dataset
  * contributes its feasible range [min(C), sum(C)] and the tree answers
  * "which datasets have at least one column overlapping the query chart's
  * y-range". Stabbing/overlap queries run in O(log n + k); no false
  * negatives, so the retrieval quality equals a linear scan (Table VIII).
  */
final class IntervalTree private (root: IntervalTree.Node) extends Serializable {

  /** Ids of all intervals overlapping [qLo, qHi]. */
  def query(qLo: Double, qHi: Double): Set[Long] = {
    val out = Set.newBuilder[Long]
    IntervalTree.collect(root, qLo, qHi, out)
    out.result()
  }
}

object IntervalTree {

  private[index] final case class Node(
      center: Double,
      byLo: Array[Interval], // intervals containing center, ascending lo
      byHi: Array[Interval], // same intervals, descending hi
      left: Node,
      right: Node
  ) extends Serializable

  def build(intervals: Seq[Interval]): IntervalTree =
    new IntervalTree(buildNode(intervals.toArray))

  private def buildNode(iv: Array[Interval]): Node = {
    if (iv.isEmpty) return null
    val pts = iv.flatMap(i => Array(i.lo, i.hi)).sorted
    val center = pts(pts.length / 2)
    val here  = iv.filter(i => i.lo <= center && center <= i.hi)
    val lefts = iv.filter(_.hi < center)
    val rights = iv.filter(_.lo > center)
    Node(
      center,
      here.sortBy(_.lo),
      here.sortBy(i => -i.hi),
      buildNode(lefts),
      buildNode(rights)
    )
  }

  private def collect(n: Node, qLo: Double, qHi: Double, out: scala.collection.mutable.Builder[Long, Set[Long]]): Unit = {
    if (n == null) return
    if (qHi < n.center) {
      // only intervals whose lo <= qHi can overlap
      var i = 0
      while (i < n.byLo.length && n.byLo(i).lo <= qHi) {
        out += n.byLo(i).id
        i += 1
      }
      collect(n.left, qLo, qHi, out)
    } else if (qLo > n.center) {
      var i = 0
      while (i < n.byHi.length && n.byHi(i).hi >= qLo) {
        out += n.byHi(i).id
        i += 1
      }
      collect(n.right, qLo, qHi, out)
    } else {
      // query straddles the center: every stored interval overlaps
      var i = 0
      while (i < n.byLo.length) { out += n.byLo(i).id; i += 1 }
      collect(n.left, qLo, qHi, out)
      collect(n.right, qLo, qHi, out)
    }
  }
}
