package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import Metrics._

class MetricsSpec extends AnyFunSuite {

  // ---- precision / recall -------------------------------------------------
  test("precisionRecall on perfect assignment") {
    val gt = Map(1L -> 10L, 2L -> 20L)
    assert(precisionRecall(Map(1L -> 10L, 2L -> 20L), gt, 2) == ((1.0, 1.0)))
  }
  test("precisionRecall counts wrong joins against precision") {
    val gt = Map(1L -> 10L, 2L -> 20L)
    val (p, r) = precisionRecall(Map(1L -> 10L, 2L -> 99L), gt, 2)
    assert(p == 0.5 && r == 0.5)
  }
  test("precisionRecall: joining an r with no ground truth is a false positive") {
    val gt = Map(1L -> 10L)
    val (p, r) = precisionRecall(Map(1L -> 10L, 5L -> 50L), gt, 1)
    assert(p == 0.5 && r == 1.0)
  }
  test("precisionRecall of empty assignment is (1, 0)") {
    assert(precisionRecall(Map.empty, Map(1L -> 1L), 1) == ((1.0, 0.0)))
  }

  // ---- PR sweep -------------------------------------------------------------
  private val gt4 = Map(1L -> 1L, 2L -> 2L, 3L -> 3L, 4L -> 4L)
  private val scored4 = Seq(
    Scored(1, 1, 0.9), // correct
    Scored(2, 2, 0.8), // correct
    Scored(3, 9, 0.7), // wrong
    Scored(4, 4, 0.6), // correct
  )

  test("prPoints sweeps in score order") {
    val pts = prPoints(scored4, gt4, 4)
    assert(pts == Vector((1.0, 0.25), (1.0, 0.5), (2.0 / 3, 0.5), (0.75, 0.75)))
  }
  test("prPoints groups score ties") {
    val pts = prPoints(Seq(Scored(1, 1, 0.5), Scored(2, 2, 0.5)), gt4, 4)
    assert(pts.size == 1 && pts.head == ((1.0, 0.5)))
  }
  test("prPoints empty input") {
    assert(prPoints(Seq.empty, gt4, 4).isEmpty)
  }

  // ---- adjusted recall ---------------------------------------------------
  test("adjustedRecall picks precision closest to but not greater than target") {
    // Points: (1.0, .25), (1.0, .5), (.667, .5), (.75, .75). Target 0.91:
    // eligible {.667, .75}; best is .75 -> recall .75.
    assert(adjustedRecall(scored4, gt4, 4, 0.91) == 0.75)
  }
  test("adjustedRecall at target 1.0 picks the best perfect-precision point") {
    // P=1.0 points have recalls .25 and .5: ties on precision resolve to
    // the larger recall.
    assert(adjustedRecall(scored4, gt4, 4, 1.0) == 0.5)
  }
  test("adjustedRecall when method is everywhere more precise than target") {
    val perfect = Seq(Scored(1, 1, 0.9), Scored(2, 2, 0.8))
    // All points have precision 1.0 > 0.9 target: report max recall (favors baseline).
    assert(adjustedRecall(perfect, gt4, 4, 0.9) == 0.5)
  }
  test("adjustedRecall of the paper's §5.1.2 example shape") {
    // Construct a sweep whose points include P=0.9 (recall .45) and
    // P=0.92-ish above the target: 20 predictions, gtTotal=20.
    val gt = (1L to 20L).map(i => i -> i).toMap
    val scored =
      (1L to 9L).map(i => Scored(i, i, 1.0 - i * 0.01)) ++ // all correct
      Seq(Scored(10L, 99L, 0.85)) ++                        // 1 wrong -> P=0.9 at k=10
      (11L to 20L).map(i => Scored(i, 99L, 0.5 - i * 0.01)) // rest wrong
    val ar = adjustedRecall(scored, gt, 20, 0.91)
    assert(ar == 0.45, s"expected recall at the P=0.9 point, got $ar")
  }

  // ---- PR-AUC ---------------------------------------------------------------
  test("prAuc of a perfect ranking is 1") {
    val gt = Map(1L -> 1L, 2L -> 2L)
    assert(prAuc(Seq(Scored(1, 1, 0.9), Scored(2, 2, 0.8)), gt, 2) == 1.0)
  }
  test("prAuc of an all-wrong ranking is 0") {
    assert(prAuc(Seq(Scored(1, 9, 0.9)), Map(1L -> 1L), 1) == 0.0)
  }
  test("prAuc is the average-precision sum") {
    val auc = prAuc(scored4, gt4, 4)
    val expected = 0.25 * 1.0 + 0.25 * 1.0 + 0.25 * 0.75
    assert(math.abs(auc - expected) < 1e-12)
  }
  test("prAuc is order-independent for equal scores") {
    val gt = Map(1L -> 1L, 2L -> 2L)
    val a = prAuc(Seq(Scored(1, 1, 0.5), Scored(2, 9, 0.5)), gt, 2)
    val b = prAuc(Seq(Scored(2, 9, 0.5), Scored(1, 1, 0.5)), gt, 2)
    assert(a == b)
  }

  // ---- pearson ---------------------------------------------------------------
  test("pearson of a perfect line is 1") {
    assert(math.abs(pearson(Seq(1, 2, 3), Seq(2, 4, 6)) - 1.0) < 1e-12)
  }
  test("pearson of a perfect inverse line is -1") {
    assert(math.abs(pearson(Seq(1, 2, 3), Seq(3, 2, 1)) + 1.0) < 1e-12)
  }
  test("pearson of a constant is 0 (degenerate)") {
    assert(pearson(Seq(1, 1, 1), Seq(1, 2, 3)) == 0.0)
  }
  test("pearson known value") {
    val r = pearson(Seq(1, 2, 3, 4), Seq(1, 3, 2, 4))
    assert(math.abs(r - 0.8) < 1e-12)
  }

  // ---- t distribution ---------------------------------------------------------
  test("studentTCdf(0) = 0.5") {
    assert(math.abs(studentTCdf(0.0, 5) - 0.5) < 1e-9)
  }
  test("studentTCdf with df=1 is the Cauchy CDF") {
    // P(T_1 <= 1) = 0.5 + atan(1)/pi = 0.75
    assert(math.abs(studentTCdf(1.0, 1) - 0.75) < 1e-6)
  }
  test("studentTCdf symmetric") {
    val a = studentTCdf(1.3, 7); val b = studentTCdf(-1.3, 7)
    assert(math.abs((a + b) - 1.0) < 1e-9)
  }
  test("upperTailPairedTTest on diffs 1..5 gives p ≈ 0.0066") {
    val p = upperTailPairedTTest(Seq(1, 2, 3, 4, 5))
    assert(p > 0.006 && p < 0.007, s"p=$p")
  }
  test("upperTailPairedTTest on zero-mean diffs gives p ≈ 0.5") {
    val p = upperTailPairedTTest(Seq(-1.0, 1.0, -1.0, 1.0))
    assert(math.abs(p - 0.5) < 1e-6)
  }
  test("upperTailPairedTTest on constant positive diffs gives 0") {
    assert(upperTailPairedTTest(Seq(0.1, 0.1, 0.1)) == 0.0)
  }

  // ---- incomplete beta ----------------------------------------------------------
  test("I_x(1,1) = x") {
    Seq(0.1, 0.5, 0.9).foreach(x =>
      assert(math.abs(regularizedIncompleteBeta(1, 1, x) - x) < 1e-9))
  }
  test("I_x(2,2) = 3x² - 2x³") {
    Seq(0.2, 0.5, 0.8).foreach { x =>
      val expected = 3 * x * x - 2 * x * x * x
      assert(math.abs(regularizedIncompleteBeta(2, 2, x) - expected) < 1e-9)
    }
  }
  test("I_0 = 0 and I_1 = 1") {
    assert(regularizedIncompleteBeta(3, 4, 0.0) == 0.0)
    assert(regularizedIncompleteBeta(3, 4, 1.0) == 1.0)
  }
  test("logGamma matches known values") {
    assert(math.abs(Metrics.logGamma(1.0)) < 1e-9)          // Γ(1) = 1
    assert(math.abs(Metrics.logGamma(5.0) - math.log(24)) < 1e-9) // Γ(5) = 24
  }
}
