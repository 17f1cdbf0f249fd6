package repro.core

import repro.vis.AggOp

/** Segment-level dataset encoder (paper Sec. IV-C) with the three
  * DA-related layers of Sec. V folded in:
  *
  *  - base segments: the column z-normalised and split into `p2`-cell
  *    segments (the Sec. IV-C encoder);
  *  - transformation layers: one aggregated view of the column per
  *    operator (avg/sum/max/min) — applying the operator *is* the
  *    transformation the paper's per-operator MLP learns;
  *  - HMRL: each operator is materialised at every binary-tree window size
  *    {4, 8, ..., p2}, giving the multi-scale representation;
  *  - the MoE gate consumes these variants inside `Matcher`.
  */
object DatasetEncoder {

  /** Encode one column under `cfg`. */
  def encodeColumn(colIdx: Int, values: Array[Double], cfg: FcmConfig): ColumnEmb = {
    var mn = Double.PositiveInfinity
    var mx = Double.NegativeInfinity
    var sm = 0.0
    var i = 0
    while (i < values.length) {
      val v = values(i)
      if (v < mn) mn = v
      if (v > mx) mx = v
      sm += v
      i += 1
    }
    val z = Features.znorm(values)
    val (segs, pos) = Features.segmentAll(z, cfg.p2)
    val variants =
      for {
        op <- if (cfg.useDa) AggOp.all else Array.empty[AggOp]
        w  <- cfg.daWindows(values.length)
      } yield {
        val agg = AggOp.aggregate(values, op, w)
        val za  = Features.znorm(agg)
        // Segment the aggregated series so each segment spans the same
        // x-fraction of the column as a base segment does (p2 raw cells
        // aggregate to p2/w points), keeping SL-SAN granularities aligned.
        val segLen = math.max(2, cfg.p2 / w)
        val (s, p) = Features.segmentAll(za, segLen)
        DaVariant(op.id, w, s, p)
      }
    ColumnEmb(colIdx, values.length, mn, mx, sm, segs, pos, variants)
  }

  /** Encode a whole table (all numeric columns). */
  def encodeTable(tableId: Long, cols: Array[Array[Double]], cfg: FcmConfig): TableEmb =
    TableEmb(tableId, cols.zipWithIndex.map { case (c, i) => encodeColumn(i, c, cfg) })
}
