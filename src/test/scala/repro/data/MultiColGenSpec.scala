package repro.data

import org.scalatest.funsuite.AnyFunSuite

class MultiColGenSpec extends AnyFunSuite {

  private val fz = MultiColGen.generate(MultiColGen.specs.head)

  test("eight specs mirroring Table 3") {
    assert(MultiColGen.specs.map(_.name) == Vector("FZ", "DA", "AB", "RI", "BR", "ABN", "IA", "BB"))
  }

  test("generation is deterministic") {
    val a = MultiColGen.generate(MultiColGen.specs.head)
    assert(a.left == fz.left && a.right == fz.right && a.gt == fz.gt)
  }

  test("every row has one value per column") {
    assert(fz.left.forall(_._2.size == fz.nCols))
    assert(fz.right.forall(_._2.size == fz.nCols))
  }

  test("match counts follow the spec") {
    val spec = MultiColGen.specs.head
    assert(fz.gtTotal == spec.nMatches)
    assert(fz.right.size == spec.nMatches + spec.nNonMatches)
  }

  test("gt points at existing left records") {
    val lIds = fz.left.map(_._1).toSet
    assert(fz.gt.values.forall(lIds.contains))
  }

  test("attribute counts span the paper's 3..16 range") {
    val tasks = MultiColGen.specs.map(MultiColGen.generate)
    assert(tasks.map(_.nCols).min == 3)
    assert(tasks.map(_.nCols).max == 16)
  }

  test("missing values appear as empty strings where configured") {
    val abn = MultiColGen.generate(MultiColGen.specs.find(_.name == "ABN").get)
    val isbnIdx = abn.columns.indexOf("isbn")
    assert(isbnIdx >= 0)
    assert(abn.left.exists(_._2(isbnIdx).isEmpty), "missL should produce empty strings")
  }

  test("informative column values of matched rows stay close to L") {
    // The FZ 'class' column is copied verbatim for matches.
    val classIdx = fz.columns.indexOf("class")
    val lById = fz.left.toMap
    val exact = fz.gt.count { case (rId, lId) =>
      val r = fz.right.find(_._1 == rId).get._2(classIdx)
      r.isEmpty || r == lById(lId)(classIdx)
    }
    assert(exact >= fz.gtTotal * 9 / 10, "class should be a stable identifier")
  }

  test("addRandomColumns appends columns of length 10-50 and keeps gt") {
    val aug = MultiColGen.addRandomColumns(fz, 2, seed = 5)
    assert(aug.nCols == fz.nCols + 2)
    assert(aug.gt == fz.gt)
    val idx = fz.nCols
    (aug.left ++ aug.right).foreach { case (_, v) =>
      assert(v(idx).length >= 10 && v(idx).length <= 50)
      assert(v(idx + 1).length >= 10 && v(idx + 1).length <= 50)
    }
  }

  test("addRandomColumns is deterministic in its seed") {
    val a = MultiColGen.addRandomColumns(fz, 2, seed = 5)
    val b = MultiColGen.addRandomColumns(fz, 2, seed = 5)
    assert(a.left == b.left && a.right == b.right)
  }
}
