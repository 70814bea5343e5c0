package repro.bench

import repro.SparkSpec
import repro.harness.{MultiColumnHarness, MultiColumnSuite, MultiReports, Reports}

/** Table 4: multi-column quality comparison (a) and robustness to random
  * columns (b).
  */
class Table4MultiColumnBench extends SparkSpec {

  test("Table 4(a) — multi-column join quality; 4(b) — random-column robustness") {
    val evals = MultiColumnSuite.evals(spark)
    val a = MultiReports.table4a(evals)
    val b = MultiReports.table4b(evals)
    Reports.writeResult("table4a.txt", a)
    Reports.writeResult("table4b.txt", b)

    val n = evals.size.toDouble
    def avg(f: MultiColumnHarness.MultiEval => Double): Double = evals.map(f).sum / n

    val autoR = avg(_.autoR)
    assert(avg(_.autoP) >= 0.70, "multi-column precision should stay high")
    // AutoFJ remains the best unsupervised method on average (Table 4a).
    Seq("Excel", "FW", "ZeroER", "ECM", "PP").foreach { m =>
      val ar = avg(_.methods(m).ar)
      assert(autoR > ar, f"AutoFJ avg R $autoR%.3f should beat $m avg AR $ar%.3f")
    }
    // Column selection picks few informative columns, not all of them.
    evals.foreach(e => assert(e.selected.nonEmpty && e.selected.size <= 4,
      s"${e.dataset}: selected ${e.selected}"))

    // Table 4(b): random columns never get selected, so AutoFJ's recall is
    // (almost) unaffected, while Excel (which concatenates everything)
    // degrades more.
    assert(math.abs(avg(_.deltaAutoR)) <= 0.05,
      f"AutoFJ dR ${avg(_.deltaAutoR)}%.3f should be ~0 under random columns")
    assert(avg(_.deltaExcelAr) <= avg(_.deltaAutoR) + 0.02,
      "Excel should degrade at least as much as AutoFJ under random columns")
  }
}
