package repro.core

/** The distance functions of Table 1, all normalized to [0, 1]
  * (0 = identical). Set-based distances operate on weighted token *sets*
  * (sorted distinct arrays + a weight per token); character-based ones on
  * preprocessed strings.
  *
  * Worked example from Figure 2 (equal weights,
  * l = {2012, tigers, lsu, baseball, team}, r = {2012, lsu, baseball, team}):
  * JD = 0.2, CD ≈ 0.11, MD = 0, DD ≈ 0.11, ID ≈ 0.56 — matched by the unit
  * tests.
  */
object Distances {

  // ---------------------------------------------------------------- char

  /** Levenshtein distance (unit costs). */
  def levenshtein(a: String, b: String): Int = {
    if (a == b) return 0
    if (a.isEmpty) return b.length
    if (b.isEmpty) return a.length
    var prev = Array.tabulate(b.length + 1)(identity)
    var curr = new Array[Int](b.length + 1)
    var i = 1
    while (i <= a.length) {
      curr(0) = i
      val ca = a.charAt(i - 1)
      var j = 1
      while (j <= b.length) {
        val cost = if (ca == b.charAt(j - 1)) 0 else 1
        curr(j) = math.min(math.min(curr(j - 1) + 1, prev(j) + 1), prev(j - 1) + cost)
        j += 1
      }
      val t = prev; prev = curr; curr = t
      i += 1
    }
    prev(b.length)
  }

  /** Edit distance normalized by the longer string's length. */
  def editDistance(a: String, b: String): Double = {
    val m = math.max(a.length, b.length)
    if (m == 0) 0.0 else levenshtein(a, b).toDouble / m
  }

  /** Jaro similarity. */
  def jaro(a: String, b: String): Double = {
    if (a == b) return 1.0
    val la = a.length; val lb = b.length
    if (la == 0 || lb == 0) return 0.0
    val matchWindow = math.max(0, math.max(la, lb) / 2 - 1)
    val aMatched = new Array[Boolean](la)
    val bMatched = new Array[Boolean](lb)
    var matches = 0
    var i = 0
    while (i < la) {
      val lo = math.max(0, i - matchWindow)
      val hi = math.min(lb - 1, i + matchWindow)
      var j = lo
      var done = false
      while (j <= hi && !done) {
        if (!bMatched(j) && a.charAt(i) == b.charAt(j)) {
          aMatched(i) = true; bMatched(j) = true; matches += 1; done = true
        }
        j += 1
      }
      i += 1
    }
    if (matches == 0) return 0.0
    var transpositions = 0
    var k = 0
    i = 0
    while (i < la) {
      if (aMatched(i)) {
        while (!bMatched(k)) k += 1
        if (a.charAt(i) != b.charAt(k)) transpositions += 1
        k += 1
      }
      i += 1
    }
    val m = matches.toDouble
    (m / la + m / lb + (m - transpositions / 2.0) / m) / 3.0
  }

  /** Jaro-Winkler distance = 1 - JW similarity (prefix scale 0.1, max 4). */
  def jaroWinkler(a: String, b: String): Double = {
    val j = jaro(a, b)
    var prefix = 0
    val maxPrefix = math.min(4, math.min(a.length, b.length))
    while (prefix < maxPrefix && a.charAt(prefix) == b.charAt(prefix)) prefix += 1
    1.0 - (j + prefix * 0.1 * (1.0 - j))
  }

  // ----------------------------------------------------------------- set

  /** Aggregates of a weighted-set pair, computed in one merge pass over two
    * sorted distinct token arrays.
    *
    * @param wl        total weight of left tokens
    * @param wr        total weight of right tokens
    * @param wInter    total weight of the intersection
    * @param rSubsetL  true iff every right token occurs in the left set
    */
  final case class SetStats(wl: Double, wr: Double, wInter: Double, rSubsetL: Boolean)

  def setStats(l: Array[String], r: Array[String], w: TokenWeights): SetStats = {
    var i = 0; var j = 0
    var wl = 0.0; var wr = 0.0; var wInter = 0.0
    var rSubset = true
    while (i < l.length && j < r.length) {
      val c = l(i).compareTo(r(j))
      if (c == 0) {
        val tw = w(l(i)); wl += tw; wr += tw; wInter += tw; i += 1; j += 1
      } else if (c < 0) { wl += w(l(i)); i += 1 }
      else { wr += w(r(j)); rSubset = false; j += 1 }
    }
    while (i < l.length) { wl += w(l(i)); i += 1 }
    while (j < r.length) { wr += w(r(j)); rSubset = false; j += 1 }
    SetStats(wl, wr, wInter, rSubset)
  }

  /** Both-empty pairs are maximally distant (missing-value convention of
    * §5.2.2: "assign maximum distances when comparing two missing values").
    */
  private def emptyGuard(s: SetStats): Boolean = s.wl == 0.0 || s.wr == 0.0

  def jaccard(s: SetStats): Double =
    if (emptyGuard(s)) 1.0 else 1.0 - s.wInter / (s.wl + s.wr - s.wInter)

  def cosineSet(s: SetStats): Double =
    if (emptyGuard(s)) 1.0 else 1.0 - s.wInter / math.sqrt(s.wl * s.wr)

  /** Max-include distance: 1 - overlap coefficient. */
  def maxInclude(s: SetStats): Double =
    if (emptyGuard(s)) 1.0 else 1.0 - s.wInter / math.min(s.wl, s.wr)

  def dice(s: SetStats): Double =
    if (emptyGuard(s)) 1.0 else 1.0 - 2.0 * s.wInter / (s.wl + s.wr)

  /** Intersection distance: 1 - w(∩)/(w(l)+w(r)); Figure 2's ID = 0.56. */
  def intersection(s: SetStats): Double =
    if (emptyGuard(s)) 1.0 else 1.0 - s.wInter / (s.wl + s.wr)

  /** Hybrid Contain-X (Table 1 footnote): if r ⊆ l, the standard distance;
    * otherwise 1.
    */
  def containJaccard(s: SetStats): Double = if (s.rSubsetL) jaccard(s) else 1.0
  def containCosine(s: SetStats): Double = if (s.rSubsetL) cosineSet(s) else 1.0
  def containDice(s: SetStats): Double = if (s.rSubsetL) dice(s) else 1.0

  /** Set distances indexed as in ConfigSpace.SetDistCodes. */
  def setDistance(d: Int, s: SetStats): Double = d match {
    case 0 => jaccard(s)
    case 1 => cosineSet(s)
    case 2 => maxInclude(s)
    case 3 => dice(s)
    case 4 => intersection(s)
    case 5 => containJaccard(s)
    case 6 => containCosine(s)
    case 7 => containDice(s)
    case other => throw new IllegalArgumentException(s"no set distance $other")
  }

  /** Char distances indexed as in ConfigSpace.CharDistCodes. */
  def charDistance(d: Int, a: String, b: String): Double = d match {
    case 0 => jaroWinkler(a, b)
    case 1 => editDistance(a, b)
    case other => throw new IllegalArgumentException(s"no char distance $other")
  }
}
