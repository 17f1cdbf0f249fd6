package repro.vis

import scala.collection.mutable

/** Extracted essential visual elements of a line chart (paper Sec. IV-A):
  * the per-line series of values (one value per pixel column, in data
  * units) and the y-axis value range recovered from the ticks.
  */
final case class ExtractedChart(lines: Array[Array[Double]], yLo: Double, yHi: Double)
    extends Serializable {
  def m: Int = lines.length
}

/** Visual element extractor — the LCSeg (Mask-RCNN) substitute.
  *
  * Line instances are recovered by clustering pixel intensities (the
  * greyscale analogue of per-instance masks); each line's trajectory is the
  * per-pixel-column centroid row, converted to data units via a
  * least-squares fit over the tick marks. Columns occluded by a later line
  * are filled by linear interpolation. Extraction error therefore grows
  * with the number of lines M — the same qualitative behaviour as the
  * paper's trained segmenter.
  */
object Extractor {

  def extract(img: ChartImage): ExtractedChart = {
    // Least-squares fit value = a*row + b over the ticks.
    val ticks = img.ticks
    require(ticks.length >= 2, "need at least two ticks to recover the y scale")
    val n  = ticks.length
    val mr = ticks.map(_.row.toDouble).sum / n
    val mv = ticks.map(_.value).sum / n
    var num = 0.0; var den = 0.0
    ticks.foreach { t =>
      num += (t.row - mr) * (t.value - mv)
      den += (t.row - mr) * (t.row - mr)
    }
    val a = if (den > 1e-12) num / den else 0.0
    val b = mv - a * mr
    def valueOf(row: Double): Double = a * row + b

    // Cluster pixels by intensity: one cluster per line instance.
    val byIntensity = mutable.LinkedHashMap.empty[Int, (Array[Double], Array[Int])]
    val w = img.width
    val h = img.height
    var r = 0
    while (r < h) {
      var c = 0
      while (c < w) {
        val p = img.pixels(r * w + c)
        if (p > 0f) {
          val key = math.round(p * 1000f)
          val (sums, cnts) =
            byIntensity.getOrElseUpdate(key, (new Array[Double](w), new Array[Int](w)))
          sums(c) += r
          cnts(c) += 1
        }
        c += 1
      }
      r += 1
    }

    val lines = byIntensity.toArray.sortBy(_._1).map { case (_, (sums, cnts)) =>
      val vals = new Array[Double](w)
      var c = 0
      while (c < w) {
        vals(c) = if (cnts(c) > 0) valueOf(sums(c) / cnts(c)) else Double.NaN
        c += 1
      }
      interpolateGaps(vals)
    }

    val yLo = math.min(valueOf(0), valueOf(h - 1))
    val yHi = math.max(valueOf(0), valueOf(h - 1))
    ExtractedChart(lines, yLo, yHi)
  }

  /** Fill NaN gaps by linear interpolation; edges extend the nearest value. */
  def interpolateGaps(vals: Array[Double]): Array[Double] = {
    val n   = vals.length
    val out = vals.clone()
    var first = -1
    var i = 0
    while (i < n && first < 0) { if (!out(i).isNaN) first = i; i += 1 }
    if (first < 0) return Array.fill(n)(0.0) // fully occluded line
    i = 0
    while (i < first) { out(i) = out(first); i += 1 }
    var last = first
    i = first + 1
    while (i < n) {
      if (!out(i).isNaN) {
        if (i - last > 1) {
          val span = i - last
          var k = 1
          while (k < span) {
            out(last + k) = out(last) + (out(i) - out(last)) * k / span
            k += 1
          }
        }
        last = i
      }
      i += 1
    }
    i = last + 1
    while (i < n) { out(i) = out(last); i += 1 }
    out
  }
}
