package repro.vis

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Features

import scala.util.Random

class ExtractorSpec extends AnyFunSuite {

  private def corr(a: Array[Double], b: Array[Double]): Double = {
    val za = Features.znorm(a)
    val zb = Features.znorm(b)
    za.zip(zb).map { case (x, y) => x * y }.sum / za.length
  }

  test("single line roundtrip: extracted series tracks the original shape") {
    val rng = new Random(1)
    var x = 0.0
    val s = Array.fill(256)({ x += rng.nextGaussian(); x })
    val img = Raster.render(Array(s), 480, 240)
    val ex  = Extractor.extract(img)
    assert(ex.m == 1)
    val resampled = Features.resample(s, 480)
    assert(corr(ex.lines(0), resampled) > 0.98)
  }

  test("extracted values are in data units (not pixels)") {
    val s   = Array.tabulate(64)(i => 1000.0 + i * 10.0)
    val img = Raster.render(Array(s), 240, 120)
    val ex  = Extractor.extract(img)
    assert(math.abs(ex.lines(0).head - 1000.0) < 25.0)
    assert(math.abs(ex.lines(0).last - 1630.0) < 25.0)
  }

  test("y-range recovery matches the rendered tick range") {
    val s   = Array.tabulate(64)(i => i * 2.0)
    val img = Raster.render(Array(s), 240, 120)
    val ex  = Extractor.extract(img)
    // tick rows are integer-rounded, so the least-squares fit is only
    // approximately exact; allow 2% of the value span
    val span = img.ticks.head.value - img.ticks.last.value
    assert(math.abs(ex.yLo - img.ticks.last.value) < 0.02 * span)
    assert(math.abs(ex.yHi - img.ticks.head.value) < 0.02 * span)
  }

  test("multi-line chart recovers every non-occluded line") {
    val series = Array.tabulate(3)(i => Array.tabulate(128)(k => math.sin(k / 9.0 + 2 * i) + 4.0 * i))
    val img = Raster.render(series, 480, 240)
    val ex  = Extractor.extract(img)
    assert(ex.m == 3)
    // separated lines: each extracted line correlates with its source
    series.indices.foreach { i =>
      val res = Features.resample(series(i), 480)
      assert(corr(ex.lines(i), res) > 0.95, s"line $i")
    }
  }

  test("crossing lines still extract with degraded but positive correlation") {
    val a = Array.tabulate(128)(k => k / 64.0)        // rising
    val b = Array.tabulate(128)(k => 2.0 - k / 64.0)  // falling, crosses a
    val img = Raster.render(Array(a, b), 480, 240)
    val ex  = Extractor.extract(img)
    assert(ex.m == 2)
    assert(corr(ex.lines(0), Features.resample(a, 480)) > 0.9)
  }

  test("identical overlapping lines collapse to fewer instances") {
    val s = Array.tabulate(64)(i => math.cos(i / 5.0))
    val img = Raster.render(Array(s, s), 240, 120)
    val ex  = Extractor.extract(img)
    assert(ex.m == 1)
  }

  test("extraction degrades as M grows (occlusion)") {
    val rng = new Random(3)
    def charts(m: Int): Double = {
      val series = Array.tabulate(m)(i =>
        Array.tabulate(128)(k => math.sin(k / 10.0 + i * 0.7) + 0.3 * rng.nextGaussian()))
      val img = Raster.render(series, 480, 240)
      val ex  = Extractor.extract(img)
      val cs = (0 until math.min(m, ex.m)).map(i => corr(ex.lines(i), Features.resample(series(i), 480)))
      cs.sum / cs.length
    }
    assert(charts(1) > charts(8))
  }

  test("interpolateGaps fills interior gaps linearly") {
    val xs = Array(1.0, Double.NaN, Double.NaN, 4.0)
    val out = Extractor.interpolateGaps(xs)
    assert(out.toSeq == Seq(1.0, 2.0, 3.0, 4.0))
  }

  test("interpolateGaps extends edges with nearest values") {
    val xs = Array(Double.NaN, 2.0, Double.NaN)
    assert(Extractor.interpolateGaps(xs).toSeq == Seq(2.0, 2.0, 2.0))
  }

  test("interpolateGaps on an all-NaN line yields zeros") {
    assert(Extractor.interpolateGaps(Array(Double.NaN, Double.NaN)).toSeq == Seq(0.0, 0.0))
  }
}
