package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

class FeaturesSpec extends AnyFunSuite {

  test("feature vector has the declared dimension") {
    assert(Features.vector("a", "b").length == Features.dim)
    assert(Features.names.length == Features.dim)
  }

  test("identical strings score 1 on similarity features") {
    val v = Features.vector("LSU Tigers", "lsu tigers") // case-insensitive
    val idx = Features.names.zipWithIndex.toMap
    assert(v(idx("jaccard_sp")) == 1.0)
    assert(v(idx("edit_sim")) == 1.0)
    assert(v(idx("exact")) == 1.0)
  }

  test("disjoint strings score 0 on set features") {
    val v = Features.vector("aaa bbb", "ccc ddd")
    val idx = Features.names.zipWithIndex.toMap
    assert(v(idx("jaccard_sp")) == 0.0)
    assert(v(idx("overlap_sp")) == 0.0)
    assert(v(idx("exact")) == 0.0)
  }

  test("all features live in [0,1]") {
    val cases = Seq(("", ""), ("a", ""), ("abc def", "def abc"), ("2008 LSU", "2008 LSU team"))
    cases.foreach { case (a, b) =>
      Features.vector(a, b).foreach(x => assert(x >= 0.0 && x <= 1.0 + 1e-12, s"($a,$b)"))
    }
  }

  test("containment is directional (r within l)") {
    val idx = Features.names.zipWithIndex.toMap
    val v = Features.vector("a b c", "a b")
    assert(v(idx("containment")) == 1.0)
    val w = Features.vector("a b", "a b c")
    assert(w(idx("containment")) < 1.0)
  }

  test("more similar pairs get larger jaccard") {
    val idx = Features.names.zipWithIndex.toMap
    val close = Features.vector("2008 lsu baseball team", "2008 lsu baseball squad")
    val far = Features.vector("2008 lsu baseball team", "drug trial results")
    assert(close(idx("jaccard_sp")) > far(idx("jaccard_sp")))
  }

  test("multi-column features concatenate per-column vectors") {
    val v = Features.vectorMulti(Seq("a", "b"), Seq("a", "c"))
    assert(v.length == 2 * Features.dim)
    assert(v.take(Features.dim).toSeq == Features.vector("a", "a").toSeq)
    assert(v.drop(Features.dim).toSeq == Features.vector("b", "c").toSeq)
  }

  test("null-safe") {
    assert(Features.vector(null, "x").length == Features.dim)
  }
}
