package repro.baselines

import repro.core.{Distances, Preprocess, Tokenize, TokenWeights}

/** Magellan-style similarity features over a record pair, shared by
  * ZeroER, ECM, Magellan-RF, DeepMatcher-MLP, and Active Learning (the
  * paper generates all their features with the Magellan package).
  */
object Features {

  val names: Vector[String] = Vector(
    "jaccard_sp", "jaccard_3g", "cosine_sp", "dice_sp", "overlap_sp",
    "jaro", "jaro_winkler", "edit_sim", "containment", "len_sim",
    "prefix_sim", "exact")

  def dim: Int = names.length

  /** Feature vector of a pair (all features are similarities in [0, 1]). */
  def vector(l: String, r: String): Array[Double] = {
    val a = Preprocess.lower(Option(l).getOrElse(""))
    val b = Preprocess.lower(Option(r).getOrElse(""))
    val spA = Tokenize.space(a); val spB = Tokenize.space(b)
    val g3A = Tokenize.ngrams(a); val g3B = Tokenize.ngrams(b)
    val sp = Distances.setStats(spA, spB, TokenWeights.equal)
    val g3 = Distances.setStats(g3A, g3B, TokenWeights.equal)
    val maxLen = math.max(a.length, b.length)
    val prefix = {
      val m = math.min(a.length, b.length)
      var i = 0
      while (i < m && a.charAt(i) == b.charAt(i)) i += 1
      if (m == 0) 0.0 else i.toDouble / m
    }
    Array(
      1.0 - Distances.jaccard(sp),
      1.0 - Distances.jaccard(g3),
      1.0 - Distances.cosineSet(sp),
      1.0 - Distances.dice(sp),
      1.0 - Distances.maxInclude(sp),
      Distances.jaro(a, b),
      1.0 - Distances.jaroWinkler(a, b),
      1.0 - Distances.editDistance(a, b),
      if (sp.wr == 0) 0.0 else sp.wInter / sp.wr,
      if (maxLen == 0) 1.0 else 1.0 - math.abs(a.length - b.length).toDouble / maxLen,
      prefix,
      if (a == b && a.nonEmpty) 1.0 else 0.0,
    )
  }

  /** Multi-column variant: features of every column concatenated. */
  def vectorMulti(l: Seq[String], r: Seq[String]): Array[Double] =
    l.indices.iterator.flatMap(c => vector(l(c), r(c))).toArray
}
