package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class UnsupervisedBaselinesSpec extends AnyFunSuite {

  private def pair(l: Long, r: Long, lt: String, rt: String) = CandPair(l, r, lt, rt)

  // ---------------------------------------------------------------- shared
  test("bestPerRight keeps each right record's best-scoring candidate") {
    val ps = Seq(
      pair(1, 100, "a", "x") -> 0.3,
      pair(2, 100, "b", "x") -> 0.7,
      pair(3, 101, "c", "y") -> 0.5)
    val out = ScoredBaselines.bestPerRight(ps)
    assert(out.map(s => s.rId -> s.lId).toMap == Map(100L -> 2L, 101L -> 3L))
  }

  test("bestPerRight breaks score ties by smaller left id") {
    val ps = Seq(pair(5, 100, "a", "x") -> 0.7, pair(2, 100, "b", "x") -> 0.7)
    assert(ScoredBaselines.bestPerRight(ps).head.lId == 2L)
  }

  // ---------------------------------------------------------------- Excel
  test("Excel scores exact matches highest") {
    val ps = Seq(
      pair(1, 100, "2008 LSU baseball team", "2008 LSU baseball team") -> (),
      pair(2, 100, "2007 Wisconsin football team", "2008 LSU baseball team") -> ())
    val out = ExcelFuzzy.run(ps.map(_._1))
    assert(out.head.lId == 1L)
  }

  test("Excel score is monotone in similarity") {
    val idf = repro.core.TokenWeights.equal
    val close = ExcelFuzzy.score(pair(1, 1, "alpha beta gamma", "alpha beta gama"), idf)
    val far = ExcelFuzzy.score(pair(1, 1, "alpha beta gamma", "delta epsilon"), idf)
    assert(close > far)
  }

  // ---------------------------------------------------------------- FuzzyWuzzy
  test("FuzzyWuzzy token-sort is word-order invariant") {
    val a = FuzzyWuzzy.score("new york mets", "mets new york")
    assert(a > 0.9)
  }

  test("FuzzyWuzzy identical strings score ~1") {
    assert(FuzzyWuzzy.score("abc def", "abc def") == 1.0)
  }

  test("FuzzyWuzzy ranks the right counterpart first") {
    val out = FuzzyWuzzy.run(Seq(
      pair(1, 100, "Mississippi State Bulldogs", "Missisippi State Bulldog"),
      pair(2, 100, "Louisiana Tigers", "Missisippi State Bulldog")))
    assert(out.head.lId == 1L)
  }

  // ---------------------------------------------------------------- ZeroER
  test("ZeroER separates a two-cluster feature distribution") {
    val rng = new Random(5)
    val matches = (0 until 40).map(i =>
      pair(i, 1000 + i, "", "") -> Array.fill(4)(0.8 + rng.nextGaussian() * 0.05))
    val nons = (0 until 160).map(i =>
      pair(i, 2000 + i, "", "") -> Array.fill(4)(0.2 + rng.nextGaussian() * 0.05))
    val all = matches ++ nons
    val model = ZeroER.fit(all.map(_._2).toArray)
    val mPost = matches.map(m => ZeroER.posterior(m._2, model))
    val nPost = nons.map(n => ZeroER.posterior(n._2, model))
    assert(mPost.sum / mPost.size > 0.9)
    assert(nPost.sum / nPost.size < 0.1)
  }

  test("ZeroER run returns one score per right record") {
    val ps = Seq(pair(1, 100, "", ""), pair(2, 100, "", ""), pair(1, 101, "", ""))
    val fs = Seq(Array(0.9, 0.9), Array(0.1, 0.1), Array(0.5, 0.5))
    val out = ZeroER.run(ps, fs)
    assert(out.map(_.rId).toSet == Set(100L, 101L))
  }

  // ---------------------------------------------------------------- ECM
  test("ECM binarize splits at column means") {
    val g = ECM.binarize(Array(Array(0.1, 0.9), Array(0.9, 0.1), Array(0.2, 0.2), Array(0.8, 0.8)))
    assert(g(0).toSeq == Seq(0, 1))
    assert(g(1).toSeq == Seq(1, 0))
  }

  test("ECM recovers a planted match pattern") {
    val rng = new Random(7)
    def noisy(v: Int) = if (rng.nextDouble() < 0.1) 1 - v else v
    val rows = (0 until 200).map { i =>
      val isM = i < 30
      Array.fill(5)(noisy(if (isM) 1 else 0))
    }.toArray
    val model = ECM.fit(rows)
    val post = rows.map(ECM.posterior(_, model))
    val mAvg = post.take(30).sum / 30
    val uAvg = post.drop(30).sum / 170
    assert(mAvg > 0.8 && uAvg < 0.2)
  }

  test("ECM run produces scores in [0,1]") {
    val ps = Seq(pair(1, 100, "", ""), pair(2, 101, "", ""), pair(3, 102, "", ""))
    val fs = Seq(Array(0.9, 0.8), Array(0.1, 0.2), Array(0.85, 0.9))
    val out = ECM.run(ps, fs)
    assert(out.forall(s => s.score >= 0.0 && s.score <= 1.0))
  }
}
