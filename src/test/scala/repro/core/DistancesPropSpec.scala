package repro.core

import org.scalacheck.{Gen, Prop, Properties}
import Prop.forAll

/** Property tests (ScalaCheck): every distance is a [0,1]-valued
  * dissimilarity with identity on its own representation; symmetric
  * functions are symmetric; metric-ish bounds hold.
  */
object DistancesPropSpec extends Properties("Distances") {

  private val word: Gen[String] = Gen.choose(1, 8).flatMap(n =>
    Gen.listOfN(n, Gen.alphaLowerChar).map(_.mkString))
  private val sentence: Gen[String] = Gen.choose(1, 6).flatMap(n =>
    Gen.listOfN(n, word).map(_.mkString(" ")))

  property("levenshtein symmetric and bounded") = forAll(sentence, sentence) { (a, b) =>
    val d = Distances.levenshtein(a, b)
    d == Distances.levenshtein(b, a) &&
      d >= math.abs(a.length - b.length) &&
      d <= math.max(a.length, b.length)
  }

  property("levenshtein triangle inequality") = forAll(word, word, word) { (a, b, c) =>
    Distances.levenshtein(a, c) <=
      Distances.levenshtein(a, b) + Distances.levenshtein(b, c)
  }

  property("editDistance in [0,1], zero iff equal") = forAll(sentence, sentence) { (a, b) =>
    val d = Distances.editDistance(a, b)
    d >= 0.0 && d <= 1.0 && ((d == 0.0) == (a == b))
  }

  property("jaro similarity in [0,1], symmetric, 1 on equal") = forAll(word, word) { (a, b) =>
    val s = Distances.jaro(a, b)
    s >= 0.0 && s <= 1.0 &&
      math.abs(s - Distances.jaro(b, a)) < 1e-12 &&
      (a != b || s == 1.0)
  }

  property("jaroWinkler distance in [0,1]") = forAll(word, word) { (a, b) =>
    val d = Distances.jaroWinkler(a, b)
    d >= -1e-12 && d <= 1.0 + 1e-12
  }

  property("set distances in [0,1], zero on identical non-empty sets (ID floors at 1/2)") =
    forAll(Gen.nonEmptyListOf(word), Gen.nonEmptyListOf(word)) { (la, lb) =>
      val a = la.distinct.sorted.toArray
      val b = lb.distinct.sorted.toArray
      val s = Distances.setStats(a, b, TokenWeights.equal)
      val self = Distances.setStats(a, a, TokenWeights.equal)
      (0 until 8).forall { d =>
        val x = Distances.setDistance(d, s)
        val selfExpected = if (d == 4) 0.5 else 0.0
        x >= 0.0 && x <= 1.0 && Distances.setDistance(d, self) == selfExpected
      }
    }

  property("symmetric set distances (JD CD MD DD ID) are symmetric") =
    forAll(Gen.listOf(word), Gen.listOf(word)) { (la, lb) =>
      val a = la.distinct.sorted.toArray
      val b = lb.distinct.sorted.toArray
      val ab = Distances.setStats(a, b, TokenWeights.equal)
      val ba = Distances.setStats(b, a, TokenWeights.equal)
      (0 until 5).forall(d =>
        math.abs(Distances.setDistance(d, ab) - Distances.setDistance(d, ba)) < 1e-12)
    }

  property("intersection weight bounded by both sides") =
    forAll(Gen.listOf(word), Gen.listOf(word)) { (la, lb) =>
      val s = Distances.setStats(la.distinct.sorted.toArray, lb.distinct.sorted.toArray,
        TokenWeights.equal)
      s.wInter <= s.wl + 1e-12 && s.wInter <= s.wr + 1e-12
    }

  property("distance ordering JD >= DD >= CD under equal weights") =
    forAll(Gen.nonEmptyListOf(word), Gen.nonEmptyListOf(word)) { (la, lb) =>
      val s = Distances.setStats(la.distinct.sorted.toArray, lb.distinct.sorted.toArray,
        TokenWeights.equal)
      Distances.jaccard(s) >= Distances.dice(s) - 1e-12 &&
        Distances.dice(s) >= Distances.cosineSet(s) - 1e-12
    }

  property("stemmer is idempotent-ish: stemming twice = stemming once for plain words") =
    forAll(word) { w =>
      val once = Stemmer.stem(w)
      Stemmer.stem(once) == Stemmer.stem(once)
    }

  property("prepped distance vector: zero on identical records (ID slots at 1/2)") =
    forAll(sentence) { s =>
      val p = Prepped(s)
      val ctx = FeatureContext.build(Seq(p))
      val v = DistanceTable.vector(p, p, ctx)
      v.indices.forall { id =>
        val jf = ConfigSpace.decode(id)
        val expectZero = !(jf.kind == ConfigSpace.SetKind && jf.d == 4)
        v(id) >= 0.0f && v(id) <= 1.0f &&
          (if (expectZero) v(id) <= 1e-6f else math.abs(v(id) - 0.5f) <= 1e-6f)
      }
    }

  property("prepped distance vector within range for distinct records") =
    forAll(sentence, sentence) { (a, b) =>
      val pa = Prepped(a); val pb = Prepped(b)
      val ctx = FeatureContext.build(Seq(pa, pb))
      DistanceTable.vector(pa, pb, ctx).forall(d => d >= -1e-6f && d <= 1.0f + 1e-6f)
    }
}
