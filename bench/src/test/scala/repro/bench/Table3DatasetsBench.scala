package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.MultiColGen
import repro.harness.Reports

/** Table 3: multi-column dataset statistics (shape of the 8 synthetic
  * mirrors of the Magellan benchmark datasets).
  */
class Table3DatasetsBench extends AnyFunSuite {

  test("Table 3 — multi-column dataset statistics") {
    val tasks = MultiColGen.specs.map(MultiColGen.generate)
    val sb = new StringBuilder
    sb.append("Table 3 — multi-column fuzzy join datasets\n")
    sb.append(f"${"Dataset"}%-8s ${"Domain"}%-14s #Attr  Size(L-R)       #Matches\n")
    tasks.foreach { t =>
      sb.append(f"${t.name}%-8s ${t.domain}%-14s ${t.nCols}%5d  ${s"${t.left.size} - ${t.right.size}"}%-14s ${t.gtTotal}%6d\n")
    }
    Reports.writeResult("table3.txt", sb.toString)

    assert(tasks.size == 8, "eight datasets as in the paper")
    assert(tasks.map(_.name) == Vector("FZ", "DA", "AB", "RI", "BR", "ABN", "IA", "BB"))
    tasks.foreach { t =>
      assert(t.gtTotal > 0 && t.gtTotal <= t.right.size)
      assert(t.left.forall(_._2.length == t.nCols))
      assert(t.right.forall(_._2.length == t.nCols))
      // Ground truth only points at existing left records.
      assert(t.gt.values.forall(l => l >= 0 && l < t.left.size))
    }
    // Attribute counts mirror Table 3's spread (3..16).
    assert(tasks.map(_.nCols).min == 3 && tasks.map(_.nCols).max == 16)
  }
}
