package repro.bench

import repro.SparkSpec
import repro.harness.{MultiColumnHarness, MultiColumnSuite, MultiReports, Reports}

/** Table 7: PR-AUC on the multi-column datasets. */
class Table7MultiPrAucBench extends SparkSpec {

  test("Table 7 — multi-column PR-AUC") {
    val evals = MultiColumnSuite.evals(spark)
    val report = MultiReports.table7(evals)
    Reports.writeResult("table7.txt", report)

    val n = evals.size.toDouble
    def avg(f: MultiColumnHarness.MultiEval => Double): Double = evals.map(f).sum / n
    val autoAuc = avg(_.autoPrAuc)
    // Paper shape: AutoFJ is the best *unsupervised* method by PR-AUC
    // (supervised Magellan/AL may edge it out).
    Seq("FW", "ZeroER", "ECM").foreach { m =>
      assert(autoAuc > avg(_.methods(m).prAuc),
        f"AutoFJ avg PR-AUC $autoAuc%.3f should beat $m")
    }
  }
}
