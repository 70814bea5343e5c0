package repro.baselines

import repro.core.{Distances, Preprocess, Tokenize, TokenWeights}
import repro.eval.Metrics.Scored

/** Candidate pairs a baseline scores: (lId, rId) with the raw strings. */
final case class CandPair(lId: Long, rId: Long, l: String, r: String)

/** Shared helper: keep each right record's best-scoring candidate (the
  * many-to-one constraint of Definition 2.1).
  */
object ScoredBaselines {
  def bestPerRight(scores: Iterable[(CandPair, Double)]): Vector[Scored] =
    scores
      .groupBy(_._1.rId)
      .map { case (rId, group) =>
        val (pair, s) = group.maxBy { case (p, sc) => (sc, -p.lId) }
        Scored(rId, pair.lId, s)
      }
      .toVector
      .sortBy(_.rId)
}

/** The Excel Fuzzy-Lookup baseline: a carefully-engineered *static*
  * weighted combination of multiple distance functions (a variant of the
  * generalized fuzzy similarity of Chaudhuri et al. [17]) — IDF-weighted
  * token Jaccard, Jaro-Winkler, normalized edit similarity, and
  * IDF-weighted containment, with fixed weights.
  */
object ExcelFuzzy {

  def score(p: CandPair, idf: TokenWeights): Double = {
    val a = Preprocess.lower(p.l); val b = Preprocess.lower(p.r)
    val sp = Distances.setStats(Tokenize.space(a), Tokenize.space(b), idf)
    val jac = 1.0 - Distances.jaccard(sp)
    val contain = if (sp.wr == 0) 0.0 else sp.wInter / sp.wr
    val jw = 1.0 - Distances.jaroWinkler(a, b)
    val ed = 1.0 - Distances.editDistance(a, b)
    0.40 * jac + 0.20 * contain + 0.20 * jw + 0.20 * ed
  }

  def run(pairs: Seq[CandPair]): Vector[Scored] = {
    val docs = (pairs.iterator.map(p => (p.lId, p.l)) ++ pairs.iterator.map(p => (-p.rId - 1, p.r)))
      .toMap.values.map(s => Tokenize.space(Preprocess.lower(s)))
    val idf = TokenWeights.idf(docs.toSeq)
    ScoredBaselines.bestPerRight(pairs.map(p => p -> score(p, idf)))
  }
}

/** The FuzzyWuzzy baseline: max of simple ratio, token-sort ratio and
  * token-set ratio, all built on edit similarity — the package's
  * `WRatio`-style combination.
  */
object FuzzyWuzzy {

  private def ratio(a: String, b: String): Double = 1.0 - Distances.editDistance(a, b)

  private def tokenSortRatio(a: String, b: String): Double =
    ratio(Tokenize.space(a).mkString(" "), Tokenize.space(b).mkString(" "))

  private def tokenSetRatio(a: String, b: String): Double = {
    val ta = Tokenize.space(a).toSet; val tb = Tokenize.space(b).toSet
    val inter = (ta intersect tb).toVector.sorted.mkString(" ")
    val sa = (inter + " " + (ta diff tb).toVector.sorted.mkString(" ")).trim
    val sb = (inter + " " + (tb diff ta).toVector.sorted.mkString(" ")).trim
    Vector(ratio(inter, sa), ratio(inter, sb), ratio(sa, sb)).max
  }

  def score(l: String, r: String): Double = {
    val a = Preprocess.lower(l); val b = Preprocess.lower(r)
    Vector(ratio(a, b), 0.95 * tokenSortRatio(a, b), 0.95 * tokenSetRatio(a, b)).max
  }

  def run(pairs: Seq[CandPair]): Vector[Scored] =
    ScoredBaselines.bestPerRight(pairs.map(p => p -> score(p.l, p.r)))
}
