package repro.eval

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("perfect ranking has prec = ndcg = 1") {
    val rel = Set(1L, 2L, 3L)
    val ranked = Seq(1L, 2L, 3L)
    assert(Metrics.precAtK(ranked, rel, 3) == 1.0)
    assert(Metrics.ndcgAtK(ranked, rel, 3) == 1.0)
  }

  test("empty overlap gives zero") {
    val rel = Set(9L)
    assert(Metrics.precAtK(Seq(1L, 2L), rel, 2) == 0.0)
    assert(Metrics.ndcgAtK(Seq(1L, 2L), rel, 2) == 0.0)
  }

  test("prec counts hits within k only") {
    val rel = Set(1L, 5L)
    assert(Metrics.precAtK(Seq(1L, 2L, 3L, 4L, 5L), rel, 2) == 0.5)
    assert(Metrics.precAtK(Seq(1L, 2L, 3L, 4L, 5L), rel, 5) == 0.4)
  }

  test("prec divides by k even when fewer results exist") {
    assert(Metrics.precAtK(Seq(1L), Set(1L), 10) == 0.1)
  }

  test("ndcg rewards early hits") {
    val rel = Set(1L)
    val early = Metrics.ndcgAtK(Seq(1L, 2L, 3L), rel, 3)
    val late  = Metrics.ndcgAtK(Seq(3L, 2L, 1L), rel, 3)
    assert(early > late && late > 0.0)
  }

  test("ndcg known value for a hit at rank 2 of one relevant") {
    val v = Metrics.ndcgAtK(Seq(9L, 1L), Set(1L), 2)
    assert(math.abs(v - 1.0 / (math.log(3) / math.log(2))) < 1e-9)
  }

  test("ideal dcg accounts for fewer relevant than k") {
    val v = Metrics.ndcgAtK(Seq(1L, 2L), Set(1L), 5)
    assert(v == 1.0) // only one relevant; one hit at rank 1 is ideal
  }

  test("degenerate k and empty relevant sets") {
    assert(Metrics.precAtK(Seq(1L), Set(1L), 0) == 0.0)
    assert(Metrics.ndcgAtK(Seq(1L), Set.empty, 3) == 0.0)
  }

  test("mean of empty sequence is zero") {
    assert(Metrics.mean(Seq.empty) == 0.0)
    assert(Metrics.mean(Seq(1.0, 3.0)) == 2.0)
  }
}
