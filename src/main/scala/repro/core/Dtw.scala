package repro.core

/** Banded dynamic time warping (paper Sec. III-A, low-level relevance).
  *
  * The paper defines `rel(d, C) = 1 / (1 + dist(d, C))` with DTW as the
  * distance between a chart data series and a candidate column. Following
  * the UCR-style practice of the cited DTW literature, series are
  * z-normalised before the distance is computed (see DESIGN.md §2 — this is
  * also what makes the benchmark's ground-truth construction coherent for
  * `sum`-aggregated queries).
  */
object Dtw {

  /** Stride-downsample `xs` to at most `maxLen` points, keeping endpoints.
    * Used to bound the O(n·band) DTW cost on long columns; preserves ranking.
    */
  def downsample(xs: Array[Double], maxLen: Int): Array[Double] = {
    val n = xs.length
    if (n <= maxLen || maxLen < 2) xs
    else Array.tabulate(maxLen)(i => xs(((i.toLong * (n - 1)) / (maxLen - 1)).toInt))
  }

  /** DTW distance with a Sakoe-Chiba band around the length-adjusted
    * diagonal. `band <= 0` selects an automatic width that is wide enough to
    * keep the warping path connected for any length ratio.
    */
  def dist(a: Array[Double], b: Array[Double], band: Int = 0): Double = {
    val n = a.length
    val m = b.length
    if (n == 0 || m == 0) return Double.PositiveInfinity
    val slope = m.toDouble / n
    val w =
      if (band > 0) band
      else math.max(8, math.max(math.ceil(0.06 * m), math.ceil(1.5 * slope)).toInt)
    val INF = Double.PositiveInfinity
    var prev = Array.fill(m + 1)(INF)
    var cur  = Array.fill(m + 1)(INF)
    prev(0) = 0.0
    var i = 1
    while (i <= n) {
      java.util.Arrays.fill(cur, INF)
      val center = ((i - 1) * slope).toInt + 1
      val lo = math.max(1, center - w)
      val hi = math.min(m, center + w)
      var j = lo
      while (j <= hi) {
        val c    = math.abs(a(i - 1) - b(j - 1))
        val diag = prev(j - 1)
        val up   = prev(j)
        val left = cur(j - 1)
        var best = diag
        if (up < best) best = up
        if (left < best) best = left
        if (best != INF) cur(j) = c + best
        j += 1
      }
      val t = prev; prev = cur; cur = t
      i += 1
    }
    prev(m)
  }

  /** Exact (un-banded) DTW — used by tests to validate the banded version. */
  def distFull(a: Array[Double], b: Array[Double]): Double =
    dist(a, b, band = math.max(a.length, b.length))

  /** Paper's low-level relevance `rel = 1/(1+dist)` over prepared series. */
  def rel(a: Array[Double], b: Array[Double]): Double = 1.0 / (1.0 + dist(a, b))
}
