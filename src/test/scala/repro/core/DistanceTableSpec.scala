package repro.core

import repro.SparkSpec

class DistanceTableSpec extends SparkSpec {

  private val L = Seq(1L -> "2008 LSU Tigers baseball team", 2L -> "Super Bowl XX Game")
  private val R = Seq(100L -> "2008 LSU baseball team", 101L -> "Super Bowl XXI Game")

  private def prepped(recs: Seq[(Long, String)]) =
    recs.map { case (id, t) => id -> Prepped(t) }.toMap

  test("vector has one entry per join function, all in [0,1]") {
    val lp = prepped(L); val rp = prepped(R)
    val ctx = FeatureContext.build(lp.values ++ rp.values)
    val v = DistanceTable.vector(lp(1L), rp(100L), ctx)
    assert(v.length == ConfigSpace.Size)
    assert(v.forall(d => d >= 0f && d <= 1f))
  }

  test("identical records have a zero vector (Intersection-distance slots at 1/2)") {
    val p = Prepped("abc def")
    val ctx = FeatureContext.build(Seq(p))
    val v = DistanceTable.vector(p, p, ctx)
    v.indices.foreach { id =>
      val jf = ConfigSpace.decode(id)
      if (jf.kind == ConfigSpace.SetKind && jf.d == 4) assert(v(id) == 0.5f, jf.label)
      else assert(v(id) == 0f, jf.label)
    }
  }

  test("both-empty records are maximally distant everywhere (missing values)") {
    val p = Prepped("")
    val ctx = FeatureContext.build(Seq(p))
    assert(DistanceTable.vector(p, p, ctx).forall(_ == 1f))
  }

  test("vector entries match the underlying distance functions") {
    val lp = prepped(L); val rp = prepped(R)
    val ctx = FeatureContext.build(lp.values ++ rp.values)
    val v = DistanceTable.vector(lp(1L), rp(100L), ctx)
    // (L, ED): normalized edit distance of lowercase strings.
    val ed = Distances.editDistance("2008 lsu tigers baseball team", "2008 lsu baseball team")
    assert(math.abs(v(ConfigSpace.charId(0, 1)) - ed) < 1e-6)
    // (L, SP, EW, JD): 4 common of 5 vs 4 tokens -> 0.2 (Example 2.1).
    val jd = v(ConfigSpace.setId(0, 1, 0, 0))
    assert(math.abs(jd - 0.2) < 1e-6)
    // Containment holds, so (L, SP, EW, CJD) equals JD here.
    assert(v(ConfigSpace.setId(0, 1, 0, 5)) == jd)
  }

  test("Spark compute matches the driver-side vector") {
    val lp = prepped(L); val rp = prepped(R)
    val ctx = FeatureContext.build(lp.values ++ rp.values)
    val pairsDf = SingleColumnPipeline.toPairDF(spark, Seq((1L, 100L), (2L, 101L)))
    val out = DistanceTable.compute(spark, pairsDf, lp, rp, ctx)
      .sortBy(p => (p.leftId, p.rightId))
    assert(out.length == 2)
    assert(out(0).d.toSeq == DistanceTable.vector(lp(1L), rp(100L), ctx).toSeq)
    assert(out(1).d.toSeq == DistanceTable.vector(lp(2L), rp(101L), ctx).toSeq)
  }

  test("computeMulti returns aligned per-column tables") {
    val lCols = Map(1L -> Array(Prepped("alpha beta"), Prepped("111")))
    val rCols = Map(100L -> Array(Prepped("alpha bta"), Prepped("112")))
    val ctxs = Array(
      FeatureContext.build(Seq(lCols(1L)(0), rCols(100L)(0))),
      FeatureContext.build(Seq(lCols(1L)(1), rCols(100L)(1))))
    val pairsDf = SingleColumnPipeline.toPairDF(spark, Seq((1L, 100L)))
    val cols = DistanceTable.computeMulti(spark, pairsDf, lCols, rCols, ctxs)
    assert(cols.length == 2)
    assert(cols(0).length == 1 && cols(1).length == 1)
    assert(cols(0)(0).leftId == 1L && cols(0)(0).rightId == 100L)
    assert(cols(0)(0).d.toSeq ==
      DistanceTable.vector(lCols(1L)(0), rCols(100L)(0), ctxs(0)).toSeq)
    assert(cols(1)(0).d.toSeq ==
      DistanceTable.vector(lCols(1L)(1), rCols(100L)(1), ctxs(1)).toSeq)
  }

  test("asymmetric Contain-* treats the left side as reference") {
    val lp = Prepped("a b c")
    val rp = Prepped("a b")
    val ctx = FeatureContext.build(Seq(lp, rp))
    val fwd = DistanceTable.vector(lp, rp, ctx)(ConfigSpace.setId(0, 1, 0, 5))
    val bwd = DistanceTable.vector(rp, lp, ctx)(ConfigSpace.setId(0, 1, 0, 5))
    assert(fwd < 1.0f, "r ⊆ l: Contain-Jaccard behaves like Jaccard")
    assert(bwd == 1.0f, "l ⊄ r in reverse: Contain-Jaccard saturates at 1")
  }
}
