package repro.bench

import repro.SparkSpec
import repro.harness.{Reports, SingleColumnHarness, SingleColumnSuite}

/** Table 5: PR-AUC per single-column dataset (appendix B). */
class Table5PrAucBench extends SparkSpec {

  test("Table 5 — PR-AUC scores on single-column datasets") {
    val evals = SingleColumnSuite.evals(spark)
    val report = Reports.table5(evals)
    Reports.writeResult("table5.txt", report)

    val n = evals.size.toDouble
    def avg(f: SingleColumnHarness.TaskEval => Double): Double = evals.map(f).sum / n
    val autoAuc = avg(_.autoPrAuc)
    // The paper's shape: AutoFJ has the best average PR-AUC among
    // unsupervised methods.
    Seq("Excel", "FW", "ZeroER", "ECM", "PP").foreach { m =>
      val auc = avg(_.methods(m).prAuc)
      assert(autoAuc > auc, f"AutoFJ avg PR-AUC $autoAuc%.3f should beat $m $auc%.3f")
    }
    // The 24-config space costs a little PR-AUC, not a lot.
    assert(avg(_.auto24PrAuc) >= autoAuc - 0.15)
  }
}
