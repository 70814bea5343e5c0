package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PreprocessSpec extends AnyFunSuite {

  test("lowercase")(assert(Preprocess.lower("2008 LSU Baseball") == "2008 lsu baseball"))
  test("lowercase leaves digits")(assert(Preprocess.lower("A1B2") == "a1b2"))

  test("removePunct replaces punctuation with spaces") {
    assert(Preprocess.removePunct("st. mary's hospital") == "st mary s hospital")
  }
  test("removePunct collapses runs of whitespace") {
    assert(Preprocess.removePunct("a -- b") == "a b")
  }
  test("removePunct keeps letters and digits") {
    assert(Preprocess.removePunct("abc 123") == "abc 123")
  }
  test("removePunct splits fused tokens") {
    assert(Preprocess.removePunct("st.mary") == "st mary")
  }

  test("stemmer: plural s")(assert(Stemmer.stem("bulldogs") == "bulldog"))
  test("stemmer: sses")(assert(Stemmer.stem("classes") == "classe" || Stemmer.stem("classes") == "class"))
  test("stemmer: ies")(assert(Stemmer.stem("parties") == "parti"))
  test("stemmer: ing")(assert(Stemmer.stem("running") == "run"))
  test("stemmer: ed")(assert(Stemmer.stem("played") == "play"))
  test("stemmer: keeps short words")(assert(Stemmer.stem("lsu") == "lsu"))
  test("stemmer: keeps ss")(assert(Stemmer.stem("chess") == "chess"))
  test("stemmer: non-alpha untouched")(assert(Stemmer.stem("2008") == "2008"))
  test("stemmer: deterministic")(assert(Stemmer.stem("baseball") == Stemmer.stem("baseball")))

  test("combo 0 is lowercase only") {
    assert(Preprocess(0, "LSU Tigers!") == "lsu tigers!")
  }
  test("combo 2 is lowercase + punctuation removal") {
    assert(Preprocess(2, "LSU Tigers!") == "lsu tigers")
  }
  test("combo 1 stems after lowercase") {
    assert(Preprocess(1, "Bulldogs") == "bulldog")
  }
  test("combo 3 applies all three") {
    assert(Preprocess(3, "The Bulldogs' den") == Preprocess.stem(Preprocess.removePunct("the bulldogs' den")))
  }
  test("allVariants returns 4 entries, first is lowercase") {
    val v = Preprocess.allVariants("A B")
    assert(v.length == 4 && v(0) == "a b")
  }
  test("invalid combo throws") {
    intercept[IllegalArgumentException](Preprocess(4, "x"))
  }
  test("codes enumerate the paper's four combos") {
    assert(Preprocess.Codes == Vector("L", "L+S", "L+RP", "L+S+RP"))
  }
}
