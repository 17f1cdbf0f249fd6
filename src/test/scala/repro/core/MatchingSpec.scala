package repro.core

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

class MatchingSpec extends AnyFunSuite {

  /** Run a scalacheck property under ScalaTest (scalatestplus is not on the
    * offline classpath, so we drive scalacheck's runner directly).
    */
  private def check(p: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(60), p)
    assert(res.passed, res.status.toString)
  }

  /** Exhaustive optimum for small matrices: try all injective assignments
    * (rows may skip).
    */
  private def brute(w: Array[Array[Double]]): Double = {
    val nR = w.length
    val nC = if (nR == 0) 0 else w(0).length
    def go(i: Int, used: Set[Int]): Double =
      if (i == nR) 0.0
      else {
        var best = go(i + 1, used) // skip row i
        for (c <- 0 until nC if !used(c)) {
          val v = w(i)(c) + go(i + 1, used + c)
          if (v > best) best = v
        }
        best
      }
    go(0, Set.empty)
  }

  private val matrixGen: Gen[Array[Array[Double]]] = for {
    nR <- Gen.choose(1, 4)
    nC <- Gen.choose(1, 4)
    vs <- Gen.listOfN(nR * nC, Gen.choose(0.0, 10.0))
  } yield Array.tabulate(nR, nC)((i, j) => vs(i * nC + j))

  test("known 2x2 matrix picks the cross assignment") {
    val w = Array(Array(1.0, 10.0), Array(10.0, 1.0))
    val (total, assign) = Matching.maxWeight(w)
    assert(total == 20.0)
    assert(assign.toSeq == Seq(1, 0))
  }

  test("diagonal-dominant matrix picks the diagonal") {
    val w = Array(Array(5.0, 1.0, 1.0), Array(1.0, 5.0, 1.0), Array(1.0, 1.0, 5.0))
    val (total, assign) = Matching.maxWeight(w)
    assert(total == 15.0)
    assert(assign.toSeq == Seq(0, 1, 2))
  }

  test("more rows than columns leaves some rows unmatched") {
    val w = Array(Array(3.0), Array(7.0), Array(5.0))
    val (total, assign) = Matching.maxWeight(w)
    assert(total == 7.0)
    assert(assign.count(_ >= 0) == 1)
    assert(assign(1) == 0)
  }

  test("empty inputs") {
    assert(Matching.maxWeight(Array.empty[Array[Double]])._1 == 0.0)
    val (t, a) = Matching.maxWeight(Array(Array.empty[Double], Array.empty[Double]))
    assert(t == 0.0 && a.toSeq == Seq(-1, -1))
  }

  test("zero matrix has zero weight") {
    val w = Array.fill(3, 4)(0.0)
    assert(Matching.maxWeight(w)._1 == 0.0)
  }

  test("assignment is injective") {
    val w = Array.fill(5, 5)(1.0)
    val (_, assign) = Matching.maxWeight(w)
    val used = assign.filter(_ >= 0)
    assert(used.distinct.length == used.length)
  }

  test("DP matches brute force on random matrices (scalacheck)") {
    check(Prop.forAll(matrixGen) { w =>
      math.abs(Matching.maxWeight(w)._1 - brute(w)) < 1e-9
    })
  }

  test("assignment total equals reported total (scalacheck)") {
    check(Prop.forAll(matrixGen) { w =>
      val (t, assign) = Matching.maxWeight(w)
      val sum = assign.zipWithIndex.collect { case (c, i) if c >= 0 => w(i)(c) }.sum
      math.abs(t - sum) < 1e-9
    })
  }

  test("greedy is never better than optimal") {
    val rng = new scala.util.Random(9)
    for (_ <- 1 to 20) {
      val w = Array.fill(4, 4)(rng.nextDouble() * 10)
      assert(Matching.greedy(w)._1 <= Matching.maxWeight(w)._1 + 1e-9)
    }
  }

  test("wide matrices fall back to greedy without crashing") {
    val rng = new scala.util.Random(10)
    val w = Array.fill(3, 20)(rng.nextDouble())
    val (t, assign) = Matching.maxWeight(w)
    assert(t > 0.0)
    assert(assign.length == 3)
  }
}
