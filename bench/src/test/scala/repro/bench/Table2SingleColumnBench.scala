package repro.bench

import repro.SparkSpec
import repro.harness.{Reports, SingleColumnHarness, SingleColumnSuite}

/** Table 2: the overall single-column comparison on the 20-task suite.
  * Prints the paper-style table and asserts the shape results the paper
  * reports: precision lands near the τ = 0.9 target, the precision
  * estimator correlates with reality (PEPCC), AutoFJ leads every
  * unsupervised baseline on average, and both ablations lose recall.
  */
class Table2SingleColumnBench extends SparkSpec {

  test("Table 2 — single-column overall quality comparison") {
    val evals = SingleColumnSuite.evals(spark)
    val report = Reports.table2(evals)
    Reports.writeResult("table2.txt", report)

    val n = evals.size.toDouble
    def avg(f: SingleColumnHarness.TaskEval => Double): Double = evals.map(f).sum / n

    val autoP = avg(_.autoP)
    val autoR = avg(_.autoR)
    assert(autoP >= 0.80 && autoP <= 1.0, s"avg precision $autoP should sit near tau=0.9")
    val pepccs = evals.map(_.pepcc).filterNot(_.isNaN)
    assert(pepccs.nonEmpty && pepccs.sum / pepccs.size >= 0.3,
      s"estimated precision should correlate with actual (PEPCC avg ${pepccs.sum / math.max(pepccs.size, 1)})")

    // UBR is a true upper bound per dataset (a correct join implies the
    // ground-truth l was the argmin under some configuration).
    evals.foreach(e => assert(e.ubr >= e.autoR - 1e-9, s"${e.dataset}: UBR ${e.ubr} < R ${e.autoR}"))

    // AutoFJ leads the unsupervised field on average (Table 2's headline).
    val unsupervised = Seq("Excel", "FW", "ZeroER", "ECM", "PP")
    unsupervised.foreach { m =>
      val ar = avg(_.methods(m).ar)
      assert(autoR > ar, f"AutoFJ avg recall $autoR%.3f should beat $m avg AR $ar%.3f")
    }
    val fStar = SingleColumnHarness.bestStaticFunction(evals)
    assert(autoR > avg(_.bsjArPerF(fStar)), "AutoFJ should beat the best static join function")

    // Ablations: dropping the union of configs or negative rules loses recall.
    assert(autoR >= avg(_.autoUcR), "union of configurations should not hurt recall")
    assert(autoR >= avg(_.autoNrR) - 1e-9, "negative rules should not hurt recall on average")
  }
}
