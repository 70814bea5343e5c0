package repro.data

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class BenchmarkGenSpec extends AnyFunSuite {

  private val spec = Benchmarks.singleColumn.head

  test("generation is deterministic in the seed") {
    val a = BenchmarkGen.generate(spec)
    val b = BenchmarkGen.generate(spec)
    assert(a.left == b.left && a.right == b.right && a.gt == b.gt)
  }

  test("different seeds give different data") {
    val a = BenchmarkGen.generate(spec)
    val b = BenchmarkGen.generate(spec.copy(seed = spec.seed + 1))
    assert(a.right != b.right)
  }

  test("reference table L is duplicate-free") {
    val t = BenchmarkGen.generate(spec)
    assert(t.left.map(_._2).distinct.size == t.left.size)
  }

  test("sizes match the spec") {
    val t = BenchmarkGen.generate(spec)
    assert(t.left.size == spec.nL)
    assert(t.right.size == spec.nR)
  }

  test("ground truth only references existing left ids") {
    val t = BenchmarkGen.generate(spec)
    val lIds = t.left.map(_._1).toSet
    assert(t.gt.values.forall(lIds.contains))
    val rIds = t.right.map(_._1).toSet
    assert(t.gt.keys.forall(rIds.contains))
  }

  test("no trivial equi-joins: right text never equals any reference text") {
    val t = BenchmarkGen.generate(spec)
    val lNames = t.left.map(_._2).toSet
    assert(t.right.forall { case (_, txt) => !lNames.contains(txt) })
  }

  test("incomplete L: some right records have no ground truth") {
    val t = BenchmarkGen.generate(spec)
    assert(t.gt.size < t.right.size, "extra entities should produce unmatched R records")
    assert(t.gtTotal == t.gt.size)
  }

  test("many-to-one: some left record receives multiple right records") {
    val t = BenchmarkGen.generate(spec)
    assert(t.gt.values.toSeq.groupBy(identity).exists(_._2.size > 1))
  }

  test("all 20 task specs generate non-degenerate tasks") {
    Benchmarks.singleColumn.foreach { s =>
      val t = BenchmarkGen.generate(s)
      assert(t.left.nonEmpty && t.right.nonEmpty && t.gt.nonEmpty, s.name)
      assert(t.left.map(_._2).distinct.size == t.left.size, s"${s.name}: L has duplicates")
    }
  }

  test("task names are unique") {
    assert(Benchmarks.singleColumn.map(_.name).distinct.size == Benchmarks.singleColumn.size)
  }

  test("roman numerals") {
    assert(BenchmarkGen.roman(1) == "I")
    assert(BenchmarkGen.roman(4) == "IV")
    assert(BenchmarkGen.roman(9) == "IX")
    assert(BenchmarkGen.roman(14) == "XIV")
    assert(BenchmarkGen.roman(40) == "XL")
    assert(BenchmarkGen.roman(90) == "XC")
    assert(BenchmarkGen.roman(49) == "XLIX")
    assert(BenchmarkGen.roman(88) == "LXXXVIII")
  }

  test("perturb always changes the string and avoids sibling collisions") {
    val rng = new Random(1)
    val names = Family.TeamSeason.entities(200, new Random(2))
    val taken = names.toSet
    names.take(50).foreach { n =>
      val v = BenchmarkGen.perturb(rng, n, spec, taken)
      assert(v != n && v.nonEmpty && !taken.contains(v))
    }
  }

  test("families produce distinct entities") {
    val fams: Seq[Family] = Seq(Family.TeamSeason, Family.RomanEvent, Family.Person,
      Family.Monarch, Family.Org, Family.Code, Family.TitleParen, Family.Station)
    fams.foreach { f =>
      val es = f.entities(100, new Random(3))
      assert(es.distinct.size == es.size, s"$f produced duplicates")
    }
  }

  test("RomanEvent names contain roman numerals (the ED-unsafe regime)") {
    val es = Family.RomanEvent.entities(50, new Random(4))
    assert(es.forall(_.matches(".*\\b[IVXLC]+\\b.*")))
  }
}
