package repro.baselines

import repro.SparkSpec
import scala.util.Random

class SupervisedSpec extends SparkSpec {

  /** A separable toy task: 40 right records, each with its true match (high
    * features) and two decoys (low features).
    */
  private def toy(seed: Long) = {
    val rng = new Random(seed)
    val pairs = Vector.newBuilder[CandPair]
    val feats = Vector.newBuilder[Array[Double]]
    val gt = Map.newBuilder[Long, Long]
    (0 until 40).foreach { i =>
      val r = 100L + i
      gt += r -> i.toLong
      pairs += CandPair(i, r, "", ""); feats += Array.fill(6)(0.8 + rng.nextGaussian() * 0.05)
      pairs += CandPair(1000 + i, r, "", ""); feats += Array.fill(6)(0.2 + rng.nextGaussian() * 0.05)
      pairs += CandPair(2000 + i, r, "", ""); feats += Array.fill(6)(0.1 + rng.nextGaussian() * 0.05)
    }
    (pairs.result(), feats.result(), gt.result())
  }

  test("Magellan-RF learns the separable task") {
    val (pairs, feats, gt) = toy(1)
    val run = SupervisedML.runSplit(spark, pairs, feats, gt, "rf", seed = 42)
    val correct = run.scored.count(s => run.testGt.get(s.rId).contains(s.lId))
    assert(run.testGtTotal > 0)
    assert(correct >= run.testGtTotal * 8 / 10, s"$correct/${run.testGtTotal}")
  }

  test("DeepMatcher-MLP runs and scores the test half") {
    val (pairs, feats, gt) = toy(2)
    val run = SupervisedML.runSplit(spark, pairs, feats, gt, "mlp", seed = 42)
    assert(run.scored.nonEmpty)
    assert(run.scored.forall(s => s.score >= 0.0 && s.score <= 1.0))
  }

  test("train/test split is over right records (no leakage)") {
    val (pairs, feats, gt) = toy(3)
    val run = SupervisedML.runSplit(spark, pairs, feats, gt, "rf", seed = 7)
    val testRs = run.scored.map(_.rId).toSet
    assert(run.testGt.keySet.subsetOf(testRs))
    assert(testRs.size < pairs.map(_.rId).distinct.size, "a train half must exist")
  }

  test("degenerate labels fall back gracefully") {
    // No positives anywhere.
    val pairs = Vector(CandPair(1, 100, "", ""), CandPair(2, 101, "", ""),
      CandPair(3, 102, "", ""), CandPair(4, 103, "", ""))
    val feats = Vector.fill(4)(Array(0.5, 0.5))
    val run = SupervisedML.runSplit(spark, pairs, feats, Map.empty[Long, Long], "rf", seed = 1)
    assert(run.scored.forall(s => !s.score.isNaN))
  }

  test("unknown model name throws") {
    val (pairs, feats, gt) = toy(4)
    intercept[IllegalArgumentException] {
      SupervisedML.runSplit(spark, pairs, feats, gt, "transformer", seed = 1)
    }
  }
}
