package repro.core

import repro.vis.ExtractedChart

/** Segment-level line chart encoder (paper Sec. IV-B): each extracted line
  * (one value per pixel column, in data units) is z-normalised and split
  * into `p1`-pixel segments, each described by a feature vector. The
  * tick-derived y-range rides along for range-overlap features and the
  * interval-tree query.
  */
object ChartEncoder {

  def encodeLine(values: Array[Double], cfg: FcmConfig): LineEmb = {
    var mn = Double.PositiveInfinity
    var mx = Double.NegativeInfinity
    values.foreach { v =>
      if (v < mn) mn = v
      if (v > mx) mx = v
    }
    val z = Features.znorm(values)
    val (segs, pos) = Features.segmentAll(z, cfg.p1)
    LineEmb(segs, pos, Features.pool(segs), mn, mx)
  }

  def encode(ex: ExtractedChart, cfg: FcmConfig): ChartEmb =
    ChartEmb(ex.lines.map(encodeLine(_, cfg)), ex.yLo, ex.yHi)
}
