package repro.core

import repro.SparkSpec
import repro.data.MultiColGen
import repro.eval.Metrics

class MultiSmokeSpec extends SparkSpec {

  test("multi-column AutoFJ selects the informative column on a small task") {
    val spec = MultiColGen.specs.head.copy( // FZ-like, scaled down
      name = "FZ-small", nL = 150, nExtra = 40, nMatches = 40, nNonMatches = 60)
    val task = MultiColGen.generate(spec)
    val t0 = System.nanoTime()
    val prep = MultiColumnAutoFJ.prepare(spark, task)
    val tPrep = (System.nanoTime() - t0) / 1e9
    val t1 = System.nanoTime()
    val res = MultiColumnAutoFJ.run(prep, tau = 0.9, gt = task.gt, gtTotal = task.gtTotal)
    val tRun = (System.nanoTime() - t1) / 1e9
    val (p, r) = Metrics.precisionRecall(res.result.assignment, task.gt, task.gtTotal)
    val cols = res.selected.map(task.columns)
    info(f"prep=$tPrep%.1fs run=$tRun%.1fs cols=$cols weights=${res.weights.toVector} " +
         f"P=$p%.3f R=$r%.3f joined=${res.result.assignment.size}")
    assert(res.selected.nonEmpty)
    assert(p >= 0.6, s"precision $p too low")
    assert(r >= 0.3, s"recall $r too low")
  }

  test("random columns are never selected (Table 4b mechanism)") {
    val spec = MultiColGen.specs.head.copy(
      name = "FZ-rand", nL = 120, nExtra = 30, nMatches = 30, nNonMatches = 40)
    val task = MultiColGen.addRandomColumns(MultiColGen.generate(spec), 2, seed = 99)
    val prep = MultiColumnAutoFJ.prepare(spark, task)
    val res = MultiColumnAutoFJ.run(prep, tau = 0.9)
    val selectedNames = res.selected.map(task.columns)
    assert(selectedNames.forall(!_.startsWith("rand")),
      s"random columns selected: $selectedNames")
  }
}
