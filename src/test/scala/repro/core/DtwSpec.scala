package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class DtwSpec extends AnyFunSuite {

  private def arr(xs: Double*): Array[Double] = xs.toArray

  test("distance of a series to itself is zero") {
    val a = arr(1, 2, 3, 4, 5, 4, 3, 2)
    assert(Dtw.dist(a, a) == 0.0)
    assert(Dtw.distFull(a, a) == 0.0)
  }

  test("distance is symmetric for equal-length series under the full band") {
    val rng = new Random(1)
    val a = Array.fill(40)(rng.nextGaussian())
    val b = Array.fill(40)(rng.nextGaussian())
    assert(math.abs(Dtw.distFull(a, b) - Dtw.distFull(b, a)) < 1e-9)
  }

  test("banded distance equals full distance when the band is wide enough") {
    val rng = new Random(2)
    val a = Array.fill(30)(rng.nextGaussian())
    val b = Array.fill(30)(rng.nextGaussian())
    assert(Dtw.dist(a, b, band = 30) == Dtw.distFull(a, b))
  }

  test("automatic band is an upper bound of the full distance") {
    val rng = new Random(3)
    for (_ <- 1 to 10) {
      val a = Array.fill(50)(rng.nextGaussian())
      val b = Array.fill(64)(rng.nextGaussian())
      assert(Dtw.dist(a, b) >= Dtw.distFull(a, b) - 1e-9)
    }
  }

  test("time-warped copies are closer than unrelated series") {
    val base    = Array.tabulate(64)(i => math.sin(i / 5.0))
    val warped  = Array.tabulate(80)(i => math.sin(i * 64.0 / 80.0 / 5.0))
    val rng     = new Random(4)
    val noise   = Array.fill(64)(rng.nextGaussian())
    assert(Dtw.dist(base, warped) < Dtw.dist(base, noise))
  }

  test("constant offset accumulates linearly") {
    val a = Array.fill(10)(0.0)
    val b = Array.fill(10)(1.0)
    assert(math.abs(Dtw.distFull(a, b) - 10.0) < 1e-9)
  }

  test("empty series have infinite distance") {
    assert(Dtw.dist(Array.empty[Double], arr(1.0)).isPosInfinity)
    assert(Dtw.dist(arr(1.0), Array.empty[Double]).isPosInfinity)
  }

  test("handles very different lengths (aggregated vs raw)") {
    val long  = Array.tabulate(256)(i => math.sin(i / 20.0))
    val short = Array.tabulate(16)(i => math.sin(i * 16.0 / 20.0))
    val d = Dtw.dist(short, long)
    assert(d.isFinite)
    val rng = new Random(5)
    val unrelated = Array.fill(256)(rng.nextGaussian())
    assert(d < Dtw.dist(short, unrelated))
  }

  test("downsample keeps length when short enough") {
    val a = arr(1, 2, 3)
    assert(Dtw.downsample(a, 10) eq a)
  }

  test("downsample reduces to maxLen and keeps endpoints") {
    val a = Array.tabulate(100)(_.toDouble)
    val d = Dtw.downsample(a, 10)
    assert(d.length == 10)
    assert(d.head == 0.0 && d.last == 99.0)
  }

  test("downsample is monotone on monotone input") {
    val a = Array.tabulate(1000)(i => i * 0.5)
    val d = Dtw.downsample(a, 32)
    assert(d.zip(d.tail).forall { case (x, y) => x <= y })
  }

  test("rel is in (0, 1] and 1 exactly for identical series") {
    val a = arr(1, 2, 3, 2, 1)
    assert(Dtw.rel(a, a) == 1.0)
    val b = arr(5, 5, 5, 5, 5)
    val r = Dtw.rel(a, b)
    assert(r > 0.0 && r < 1.0)
  }

  test("more noise means lower rel (statistical)") {
    val rng  = new Random(6)
    val base = Array.tabulate(128)(i => math.sin(i / 8.0))
    def noisy(sigma: Double) = base.map(_ + sigma * rng.nextGaussian())
    val rSmall = Dtw.rel(base, noisy(0.05))
    val rBig   = Dtw.rel(base, noisy(1.0))
    assert(rSmall > rBig)
  }

  test("banded DTW stays connected for extreme length ratios") {
    val a = Array.tabulate(8)(_.toDouble)
    val b = Array.tabulate(256)(i => i / 32.0)
    assert(Dtw.dist(a, b).isFinite)
    assert(Dtw.dist(b, a).isFinite)
  }
}
