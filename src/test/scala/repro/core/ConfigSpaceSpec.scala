package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ConfigSpaceSpec extends AnyFunSuite {

  test("total space size is 140 = 4·2 + 4·2·2·8 + 4") {
    assert(ConfigSpace.Size == 140)
    assert(ConfigSpace.full.size == 140)
  }

  test("kind bands: char ids 0..7, set ids 8..135, embed ids 136..139") {
    assert((0 until 8).forall(ConfigSpace.decode(_).kind == ConfigSpace.CharKind))
    assert((8 until 136).forall(ConfigSpace.decode(_).kind == ConfigSpace.SetKind))
    assert((136 until 140).forall(ConfigSpace.decode(_).kind == ConfigSpace.EmbedKind))
  }

  test("encode/decode roundtrip for char ids") {
    for (p <- 0 until 4; d <- 0 until 2) {
      val jf = ConfigSpace.decode(ConfigSpace.charId(p, d))
      assert(jf.p == p && jf.d == d && jf.kind == ConfigSpace.CharKind)
    }
  }

  test("encode/decode roundtrip for set ids") {
    for (p <- 0 until 4; t <- 0 until 2; w <- 0 until 2; d <- 0 until 8) {
      val jf = ConfigSpace.decode(ConfigSpace.setId(p, t, w, d))
      assert(jf.p == p && jf.t == t && jf.w == w && jf.d == d)
    }
  }

  test("encode/decode roundtrip for embed ids") {
    for (p <- 0 until 4) {
      val jf = ConfigSpace.decode(ConfigSpace.embedId(p))
      assert(jf.p == p && jf.kind == ConfigSpace.EmbedKind)
    }
  }

  test("ids are dense and unique") {
    assert(ConfigSpace.full.map(_.id) == (0 until 140).toVector)
  }

  test("labels are unique and human-readable") {
    val labels = ConfigSpace.full.map(_.label)
    assert(labels.distinct.size == 140)
    assert(labels.exists(_.contains("JD")))
    assert(labels.exists(_.contains("GED")))
  }

  test("decode out of range throws") {
    intercept[IllegalArgumentException](ConfigSpace.decode(140))
    intercept[IllegalArgumentException](ConfigSpace.decode(-1))
  }

  test("reduced24 has 24 valid distinct ids inside the full space") {
    assert(ConfigSpace.reduced24.size == 24)
    assert(ConfigSpace.reduced24.forall(id => id >= 0 && id < 140))
    assert(ConfigSpace.reduced24.distinct.size == 24)
  }

  test("reduced24 uses only preprocessing combos L and L+S+RP") {
    assert(ConfigSpace.reduced24.map(ConfigSpace.decode).forall(jf => jf.p == 0 || jf.p == 3))
  }

  test("threshold grid: s equal steps ending at 1.0") {
    val t = ConfigSpace.thresholds(50)
    assert(t.length == 50)
    assert(math.abs(t(0) - 0.02) < 1e-12)
    assert(t.last == 1.0)
    assert(t.toVector == t.toVector.sorted)
  }

  test("JoinConfig label mentions the function and threshold") {
    val c = ConfigSpace.JoinConfig(ConfigSpace.charId(0, 1), 0.12)
    assert(c.label.contains("ED") && c.label.contains("0.12"))
  }
}
