package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Driver-side search tests on hand-built distance tables — the 1-D
  * analogue of the Figure 4 grid world.
  */
class AutoFJSearchSpec extends AnyFunSuite {

  /** Single-function SearchData from explicit distances. */
  private def data1(
      lr: Seq[(Long, Long, Double)],
      ll: Seq[(Long, Long, Double)],
  ): SearchData =
    SearchData.fromSingle(
      lr.map { case (l, r, d) => PairDist(l, r, Array(d.toFloat)) }.toArray,
      ll.map { case (l, r, d) => PairDist(l, r, Array(d.toFloat)) }.toArray,
      fids = Array(0))

  /** Two-function SearchData (for conflict tests). */
  private def data2(
      lr: Seq[(Long, Long, Double, Double)],
      ll: Seq[(Long, Long, Double, Double)],
  ): SearchData =
    SearchData.fromSingle(
      lr.map { case (l, r, d0, d1) => PairDist(l, r, Array(d0.toFloat, d1.toFloat)) }.toArray,
      ll.map { case (l, r, d0, d1) => PairDist(l, r, Array(d0.toFloat, d1.toFloat)) }.toArray,
      fids = Array(0, 1))

  // Reference records on a 1-D grid at positions 0, 10, 20, 30 (unit = /100).
  private val grid = Seq(0L -> 0, 1L -> 10, 2L -> 20, 3L -> 30)
  private val llGrid = for {
    (a, pa) <- grid; (b, pb) <- grid if a != b
  } yield (a, b, math.abs(pa - pb) / 100.0)

  // r1 sits near l0 (a "safe" join); r2 sits between l0 and l1 (unsafe —
  // its true counterpart is missing, the Figure 4(b) case).
  private val lrGrid = Seq(
    (0L, 100L, 0.02), (1L, 100L, 0.08),
    (0L, 101L, 0.049), (1L, 101L, 0.051),
  )

  test("2d-ball: safe join estimated at precision 1, unsafe at 1/2") {
    val d = data1(lrGrid, llGrid)
    val res = AutoFJ.search(d, thetas = Array(0.02, 0.05), tau = 0.0)
    assert(res.assignment == Map(100L -> 0L, 101L -> 0L))
    assert(res.scores(100L) == 1.0, "clean 2d-ball around l0 for r1")
    assert(res.scores(101L) == 0.5, "l1 falls inside the 2d-ball for r2")
  }

  test("precision target stops the greedy before the unsafe join") {
    val d = data1(lrGrid, llGrid)
    val res = AutoFJ.search(d, thetas = Array(0.02, 0.05), tau = 0.9)
    assert(res.assignment == Map(100L -> 0L))
    assert(res.estPrecision == 1.0)
    assert(res.program.size == 1)
    assert(res.program.head.theta == 0.02)
  }

  test("lower precision target admits the unsafe join") {
    val d = data1(lrGrid, llGrid)
    val res = AutoFJ.search(d, thetas = Array(0.02, 0.05), tau = 0.6)
    assert(res.assignment == Map(100L -> 0L, 101L -> 0L))
    assert(math.abs(res.estPrecision - 0.75) < 1e-9)
  }

  test("each r joins its closest l (Eq. 1)") {
    val lr = Seq((0L, 100L, 0.3), (1L, 100L, 0.1), (2L, 100L, 0.5))
    val res = AutoFJ.search(data1(lr, llGrid), thetas = Array(0.5), tau = 0.0)
    assert(res.assignment == Map(100L -> 1L))
  }

  test("greedy prefers the high-profit (clean) configuration first") {
    val d = data1(lrGrid, llGrid)
    val res = AutoFJ.search(d, thetas = Array(0.02, 0.05), tau = 0.0)
    assert(res.program.head.theta == 0.02, "clean config selected first")
    assert(res.trace.head.estPrecision == 1.0)
  }

  test("trace carries actuals when ground truth is provided") {
    val d = data1(lrGrid, llGrid)
    val res = AutoFJ.search(d, thetas = Array(0.02, 0.05), tau = 0.0,
      gt = Map(100L -> 0L, 101L -> 1L), gtTotal = 2)
    assert(res.trace.head.actPrecision == 1.0)
    assert(res.trace.head.actRecall == 0.5)
    assert(res.trace.last.actPrecision == 0.5) // r2 joined to l0 but gt says l1
  }

  test("conflict resolution: the more confident assignment wins") {
    // f0 joins r->l0 with a crowded ball; f1 joins r->l1 with a clean ball.
    val lr = Seq(
      (0L, 100L, 0.05, 0.9),
      (1L, 100L, 0.9, 0.02),
    )
    val ll = Seq(
      (0L, 1L, 0.08, 0.9), (1L, 0L, 0.08, 0.9), // l1 inside f0's 2θ-ball of l0
      (0L, 2L, 0.09, 0.9), (2L, 0L, 0.09, 0.9),
      (1L, 2L, 0.9, 0.9), (2L, 1L, 0.9, 0.9),
    )
    val res = AutoFJ.search(data2(lr, ll), thetas = Array(0.05), tau = 0.0)
    // Under f0: ball(l0, 0.1) = {l0, l1, l2} -> prec 1/3.
    // Under f1: ball(l1, 0.1) = {l1} -> prec 1.
    assert(res.assignment == Map(100L -> 1L))
    assert(res.scores(100L) == 1.0)
  }

  test("no joinable candidates yields an empty program") {
    // The only pair sits beyond every threshold.
    val res = AutoFJ.search(data1(Seq((0L, 100L, 0.9)), llGrid),
      thetas = Array(0.1, 0.2), tau = 0.9)
    assert(res.assignment.isEmpty)
    assert(res.program.isEmpty)
  }

  test("empty L-R table yields an empty result") {
    val res = AutoFJ.search(data1(Seq.empty, llGrid), thetas = Array(0.1), tau = 0.9)
    assert(res.assignment.isEmpty && res.program.isEmpty && res.estTP == 0.0)
  }

  test("searchOneConfig picks the max-TP config meeting the target") {
    val d = data1(lrGrid, llGrid)
    val res = AutoFJ.searchOneConfig(d, thetas = Array(0.02, 0.05), tau = 0.9)
    assert(res != null)
    assert(res.assignment == Map(100L -> 0L))
    assert(res.program.size == 1)
  }

  test("searchOneConfig returns null when nothing meets the target") {
    // Only the unsafe pair exists: precision 0.5 < 0.9 everywhere.
    val lr = Seq((0L, 101L, 0.049), (1L, 101L, 0.051))
    val res = AutoFJ.searchOneConfig(data1(lr, llGrid), thetas = Array(0.05), tau = 0.9)
    assert(res == null)
  }

  test("searchOneConfig with tau=0 joins through the best single config") {
    // θ=0.02 gives TP=1 (one clean join); θ=0.05 gives TP=0.5+0.5=1 too —
    // a tie, resolved to the first (smaller θ) config deterministically.
    val d = data1(lrGrid, llGrid)
    val res = AutoFJ.searchOneConfig(d, thetas = Array(0.02, 0.05), tau = 0.0)
    assert(res != null && res.assignment.nonEmpty)
    assert(math.abs(res.estTP - 1.0) < 1e-9)
  }

  test("deterministic: same input, same program") {
    val d1 = data1(lrGrid, llGrid)
    val d2 = data1(lrGrid, llGrid)
    val a = AutoFJ.search(d1, Array(0.02, 0.05), 0.9)
    val b = AutoFJ.search(d2, Array(0.02, 0.05), 0.9)
    assert(a.program == b.program && a.assignment == b.assignment)
  }
}
