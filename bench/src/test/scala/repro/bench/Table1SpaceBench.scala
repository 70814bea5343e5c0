package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ConfigSpace

/** Table 1: the parameter space — 140 join functions (4·2 + 4·2·2·8 + 4)
  * and the reduced 24-function space of Table 6.
  */
class Table1SpaceBench extends AnyFunSuite {

  test("Table 1 — configuration space enumeration") {
    val byKind = ConfigSpace.full.groupBy(_.kind).view.mapValues(_.size).toMap
    val out = new StringBuilder
    out.append("Table 1 — join function space\n")
    out.append(s"  character-based: ${byKind(ConfigSpace.CharKind)} (paper: 4 x 2 = 8)\n")
    out.append(s"  set-based:       ${byKind(ConfigSpace.SetKind)} (paper: 4 x 2 x 2 x 8 = 128)\n")
    out.append(s"  embedding-based: ${byKind(ConfigSpace.EmbedKind)} (paper: 4 x 1 = 4)\n")
    out.append(s"  total:           ${ConfigSpace.Size} (paper: 140)\n")
    out.append(s"  reduced space:   ${ConfigSpace.reduced24.size} (paper: 24)\n")
    println(out.toString)

    assert(ConfigSpace.Size == 140)
    assert(byKind(ConfigSpace.CharKind) == 8)
    assert(byKind(ConfigSpace.SetKind) == 128)
    assert(byKind(ConfigSpace.EmbedKind) == 4)
    assert(ConfigSpace.reduced24.size == 24)
    assert(ConfigSpace.reduced24.distinct.size == 24)
    assert(ConfigSpace.full.map(_.label).distinct.size == 140, "labels must be unique")
  }
}
