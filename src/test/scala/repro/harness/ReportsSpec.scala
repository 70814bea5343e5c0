package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import SingleColumnHarness.{MethodEval, TaskEval}

class ReportsSpec extends AnyFunSuite {

  private def eval(name: String, r: Double): TaskEval = {
    val methods = SingleColumnHarness.BaselineNames.map(m =>
      m -> MethodEval(ar = r - 0.1, prAuc = r - 0.05)).toMap
    TaskEval(name, 100, 50, ubr = 0.9, pepcc = 0.9, rercc = 0.9,
      autoP = 0.9, autoR = r, autoPrAuc = r, autoUcR = r - 0.04, autoNrR = r - 0.02,
      auto24P = 0.9, auto24R = r - 0.03, auto24PrAuc = r - 0.02,
      bsjArPerF = Array.fill(repro.core.ConfigSpace.Size)(r - 0.2),
      bsjPrAucPerF = Array.fill(repro.core.ConfigSpace.Size)(r - 0.2),
      methods = methods)
  }

  private val evals = Seq(eval("Alpha", 0.6), eval("Beta", 0.7), eval("Gamma", 0.8))

  test("table2 renders every dataset row plus summary rows") {
    val t = Reports.table2(evals)
    assert(t.contains("Alpha") && t.contains("Beta") && t.contains("Gamma"))
    assert(t.contains("Average"))
    assert(t.contains("T-test"))
    assert(t.contains("PR-AUC"))
  }

  test("table2 average of AutoFJ recall is correct") {
    val t = Reports.table2(evals)
    assert(t.contains("0.700"), "avg recall (0.6+0.7+0.8)/3 = 0.700 should appear")
  }

  test("table5 renders PR-AUC columns") {
    val t = Reports.table5(evals)
    assert(t.contains("AutoFJ-24cfg"))
    assert(SingleColumnHarness.BaselineNames.forall(t.contains))
  }

  test("table6 renders the 24-vs-140 comparison") {
    val t = Reports.table6(evals)
    assert(t.contains("P(24)") && t.contains("R(140)"))
  }

  test("bestStaticFunction maximizes mean AR") {
    val e1 = eval("A", 0.6)
    e1.bsjArPerF(7) = 0.99
    val e2 = eval("B", 0.6)
    e2.bsjArPerF(7) = 0.95
    assert(SingleColumnHarness.bestStaticFunction(Seq(e1, e2)) == 7)
  }

  test("fmt handles NaN") {
    assert(Reports.fmt(Double.NaN).trim == "NA")
    assert(Reports.fmt(0.1234) == "0.123")
  }
}
