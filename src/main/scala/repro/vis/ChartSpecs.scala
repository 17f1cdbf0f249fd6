package repro.vis

/** A visualization specification, mirroring the role of Plotly's
  * vis-config in the paper's benchmark: which columns of a table are
  * plotted as lines, and optionally which aggregation (operator, window)
  * is applied to all of them before plotting.
  */
final case class ChartSpec(yCols: Vector[Int], agg: Option[(AggOp, Int)]) extends Serializable {
  /** Number of lines M in the resulting chart. */
  def m: Int = yCols.length
  def isDa: Boolean = agg.isDefined
}

object ChartSpec {

  /** The underlying data D of the chart (paper Sec. II): one data series
    * per selected column, aggregated if the spec says so. All series share
    * the (implicit, index-valued) x-axis.
    */
  def underlying(cols: Array[Array[Double]], spec: ChartSpec): Array[Array[Double]] =
    spec.yCols.toArray.map { c =>
      spec.agg match {
        case Some((op, w)) => AggOp.aggregate(cols(c), op, w)
        case None          => cols(c).clone()
      }
    }
}
