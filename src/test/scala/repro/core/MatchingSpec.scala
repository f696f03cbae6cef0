package repro.core

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

class MatchingSpec extends AnyFunSuite {

  /** exponential-time exact matching for cross-checking */
  private def bruteForce(w: Array[Array[Double]]): Double = {
    val m = w.length
    if (m == 0) return 0.0
    val n = w(0).length
    def rec(i: Int, used: Set[Int]): Double =
      if (i == m) 0.0
      else {
        val skip = rec(i + 1, used)
        val takes = (0 until n).collect {
          case j if !used(j) && w(i)(j) > 0 => w(i)(j) + rec(i + 1, used + j)
        }
        (skip +: takes).max
      }
    rec(0, Set.empty)
  }

  /** weights of the paper's Figure 7 (τ = 0.5 already applied: the 0.3 edge
    * s3–t3 is below threshold).
    */
  private val fig7: Array[Array[Double]] = {
    val w = Array.ofDim[Double](4, 3)
    w(0)(0) = 0.8; w(0)(1) = 0.85 // s1-t1, s1-t2
    w(1)(1) = 0.7                 // s2-t2
    w(2)(2) = 0.3                 // s3-t3 — below τ
    w(3)(2) = 0.65                // s4-t3
    w
  }

  test("Figure 7 example: max matching is 2.15") {
    val (score, pairs) = Matching.maxWeightMatching(Matching.thresholded(fig7, 0.5))
    assert(math.abs(score - 2.15) < 1e-9)
    assert(pairs.toSet == Set((0, 0), (1, 1), (3, 2)))
  }

  test("thresholded zeroes sub-τ entries and keeps the rest") {
    val t = Matching.thresholded(fig7, 0.5)
    assert(t(2)(2) == 0.0)
    assert(t(0)(1) == 0.85)
  }

  test("empty matrices give zero score") {
    assert(Matching.maxWeightMatching(Array.empty[Array[Double]])._1 == 0.0)
    assert(Matching.maxWeightMatching(Array(Array.empty[Double]))._1 == 0.0)
  }

  test("single edge") {
    val (s, p) = Matching.maxWeightMatching(Array(Array(0.9)))
    assert(s == 0.9 && p == Seq((0, 0)))
  }

  test("square identity-favoured matrix picks the diagonal") {
    val w = Array(
      Array(1.0, 0.1, 0.1),
      Array(0.1, 1.0, 0.1),
      Array(0.1, 0.1, 1.0))
    val (s, p) = Matching.maxWeightMatching(w)
    assert(math.abs(s - 3.0) < 1e-9)
    assert(p.toSet == Set((0, 0), (1, 1), (2, 2)))
  }

  test("greedy-suboptimal case is solved optimally") {
    // greedy would take (0,0)=0.9 then only (1,1)=0.1 → 1.0;
    // optimal is (0,1)+(1,0) = 0.8+0.8 = 1.6
    val w = Array(
      Array(0.9, 0.8),
      Array(0.8, 0.1))
    val (s, _) = Matching.maxWeightMatching(w)
    assert(math.abs(s - 1.6) < 1e-9)
  }

  test("wide matrix (more columns than rows)") {
    val w = Array(Array(0.1, 0.9, 0.3))
    val (s, p) = Matching.maxWeightMatching(w)
    assert(s == 0.9 && p == Seq((0, 1)))
  }

  test("tall matrix (more rows than columns)") {
    val w = Array(Array(0.2), Array(0.9), Array(0.5))
    val (s, p) = Matching.maxWeightMatching(w)
    assert(s == 0.9 && p == Seq((1, 0)))
  }

  test("matched pairs never reuse a row or column") {
    val w = Array(
      Array(0.5, 0.6, 0.7),
      Array(0.7, 0.6, 0.5),
      Array(0.6, 0.9, 0.6))
    val (_, pairs) = Matching.maxWeightMatching(w)
    assert(pairs.map(_._1).distinct.size == pairs.size)
    assert(pairs.map(_._2).distinct.size == pairs.size)
  }

  test("Hungarian equals brute force on random small matrices (property)") {
    val gen = for {
      m <- Gen.choose(1, 5)
      n <- Gen.choose(1, 5)
      vals <- Gen.listOfN(m * n, Gen.choose(0.0, 1.0))
    } yield Array.tabulate(m, n)((i, j) => vals(i * n + j))
    val prop = Prop.forAll(gen) { w =>
      val (hung, _) = Matching.maxWeightMatching(w)
      math.abs(hung - bruteForce(w)) < 1e-9
    }
    assert(SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(80), prop).passed)
  }

  test("tableUnionability of identical embeddings equals column count") {
    val e = IndexedSeq(Array(1f, 0f), Array(0f, 1f))
    val u = Matching.tableUnionability(e, e, 0.5)
    assert(math.abs(u - 2.0) < 1e-6)
  }

  test("tableUnionability is symmetric") {
    val rnd = new scala.util.Random(3)
    val a = IndexedSeq.fill(3)(Linalg.normalize(Array.fill(8)(rnd.nextGaussian().toFloat)))
    val b = IndexedSeq.fill(5)(Linalg.normalize(Array.fill(8)(rnd.nextGaussian().toFloat)))
    val u1 = Matching.tableUnionability(a, b, 0.0)
    val u2 = Matching.tableUnionability(b, a, 0.0)
    assert(math.abs(u1 - u2) < 1e-9)
  }
}
