package repro.core

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

class BoundsSpec extends AnyFunSuite {

  private val fig7: Array[Array[Double]] = {
    val w = Array.ofDim[Double](4, 3)
    w(0)(0) = 0.8; w(0)(1) = 0.85
    w(1)(1) = 0.7
    w(2)(2) = 0.3
    w(3)(2) = 0.65
    w
  }

  test("Example 4.2: upper bound is 3.0") {
    assert(math.abs(Bounds.upperBound(fig7, 0.5) - 3.0) < 1e-9)
  }

  test("Example 4.2: lower bound is 1.5") {
    assert(math.abs(Bounds.lowerBound(fig7, 0.5) - 1.5) < 1e-9)
  }

  test("Example 4.2: LB ≤ exact (2.15) ≤ UB") {
    val exact = Matching.maxWeightMatching(Matching.thresholded(fig7, 0.5))._1
    assert(math.abs(exact - 2.15) < 1e-9)
    assert(Bounds.lowerBound(fig7, 0.5) <= exact)
    assert(exact <= Bounds.upperBound(fig7, 0.5))
  }

  test("edges are sorted descending and τ-filtered") {
    val es = Bounds.edges(fig7, 0.5)
    assert(es.map(_._3) == es.map(_._3).sorted(Ordering[Double].reverse))
    assert(!es.exists(_._3 < 0.5))
    assert(es.size == 4)
  }

  test("bounds of an empty graph are 0") {
    assert(Bounds.upperBound(Array.empty[Array[Double]], 0.5) == 0.0)
    assert(Bounds.lowerBound(Array(Array(0.1)), 0.5) == 0.0)
  }

  test("bounds collapse to the exact value for a single edge") {
    val w = Array(Array(0.9))
    assert(Bounds.upperBound(w, 0.5) == 0.9)
    assert(Bounds.lowerBound(w, 0.5) == 0.9)
  }

  test("LB ≤ exact ≤ UB on random matrices (property)") {
    val gen = for {
      m <- Gen.choose(1, 6)
      n <- Gen.choose(1, 6)
      tau <- Gen.choose(0.0, 0.8)
      vals <- Gen.listOfN(m * n, Gen.choose(0.0, 1.0))
    } yield (Array.tabulate(m, n)((i, j) => vals(i * n + j)), tau)
    val prop = Prop.forAll(gen) { case (w, tau) =>
      val exact = Matching.maxWeightMatching(Matching.thresholded(w, tau))._1
      val lb = Bounds.lowerBound(w, tau)
      val ub = Bounds.upperBound(w, tau)
      lb <= exact + 1e-9 && exact <= ub + 1e-9
    }
    assert(SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(200), prop).passed)
  }

  test("UB stops once one side is fully covered") {
    // two rows, one column: after the heaviest edge the column side is covered
    val w = Array(Array(0.9), Array(0.8))
    assert(Bounds.upperBound(w, 0.5) == 0.9)
  }

  test("LB equals exact when the greedy choice is optimal") {
    val w = Array(
      Array(1.0, 0.0),
      Array(0.0, 0.9))
    val exact = Matching.maxWeightMatching(w)._1
    assert(Bounds.lowerBound(w, 0.5) == exact)
  }
}
