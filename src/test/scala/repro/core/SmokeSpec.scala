package repro.core

import repro.SparkSpec
import repro.data.Benchmarks
import repro.eval.Metrics

/** End-to-end smoke: AutoFJ on a tiny synthetic task should hit a high
  * actual precision (near the τ = 0.9 target) with non-trivial recall.
  */
class SmokeSpec extends SparkSpec {

  test("AutoFJ end-to-end on tiny TeamSeason task") {
    val task = Benchmarks.tiny()
    val t0 = System.nanoTime()
    val prepared = SingleColumnPipeline.prepare(spark, task.left, task.right)
    val tPrep = (System.nanoTime() - t0) / 1e9
    val t1 = System.nanoTime()
    val res = SingleColumnPipeline.autoFJ(prepared, tau = 0.9,
      gt = task.gt, gtTotal = task.gtTotal)
    val tSearch = (System.nanoTime() - t1) / 1e9
    val (p, r) = Metrics.precisionRecall(res.assignment, task.gt, task.gtTotal)
    info(f"prep=${tPrep}%.1fs search=${tSearch}%.1fs estP=${res.estPrecision}%.3f " +
         f"actP=$p%.3f actR=$r%.3f configs=${res.program.size} " +
         f"joined=${res.assignment.size} gtTotal=${task.gtTotal} " +
         f"rules=${prepared.rules.size} lr=${prepared.lrAll.length} ll=${prepared.llPairs.length}")
    assert(res.program.nonEmpty, "greedy selected no configuration")
    assert(p >= 0.7, s"actual precision $p too far below the 0.9 target")
    assert(r >= 0.3, s"recall $r unexpectedly low")
  }
}
