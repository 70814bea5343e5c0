package repro.bench

import repro.SparkSpec
import repro.harness.{Reports, SingleColumnHarness, SingleColumnSuite}

/** Table 6: AutoFJ restricted to 24 configurations — precision should be
  * virtually unchanged, recall only slightly lower (paper: 0.582 vs 0.624).
  */
class Table6ReducedSpaceBench extends SparkSpec {

  test("Table 6 — reduced 24-configuration space") {
    val evals = SingleColumnSuite.evals(spark)
    val report = Reports.table6(evals)
    Reports.writeResult("table6.txt", report)

    val n = evals.size.toDouble
    def avg(f: SingleColumnHarness.TaskEval => Double): Double = evals.map(f).sum / n
    val p24 = avg(_.auto24P); val r24 = avg(_.auto24R)
    val p140 = avg(_.autoP); val r140 = avg(_.autoR)
    assert(math.abs(p24 - p140) <= 0.08,
      f"precision should be nearly unchanged: 24cfg $p24%.3f vs 140cfg $p140%.3f")
    assert(r24 <= r140 + 0.02, "a smaller space cannot beat the full space by much")
    assert(r24 >= r140 - 0.15, "the reduced space should lose only a little recall")
  }
}
