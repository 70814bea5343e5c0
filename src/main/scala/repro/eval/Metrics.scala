package repro.eval

/** Evaluation metrics of §5: precision / normalized recall (Eq. 3–4),
  * Adjusted Recall, PR-AUC, Pearson correlation (PEPCC/RERCC), and the
  * upper-tailed paired t-test used in Tables 2 and 4.
  */
object Metrics {

  /** Precision and normalized recall of a many-to-one assignment.
    *
    * @param gtTotal |{r : J_G(r) ≠ ∅}| (the paper's absolute recall divided
    *                by this constant gives the tabled fraction)
    */
  def precisionRecall(
      assignment: Map[Long, Long],
      gt: Map[Long, Long],
      gtTotal: Int,
  ): (Double, Double) = {
    if (assignment.isEmpty) return (1.0, 0.0)
    val correct = assignment.count { case (r, l) => gt.get(r).contains(l) }
    (correct.toDouble / assignment.size,
     if (gtTotal == 0) 0.0 else correct.toDouble / gtTotal)
  }

  /** A scored many-to-one prediction: each right record with its best left
    * candidate and a confidence score (higher = more likely a match).
    */
  final case class Scored(rId: Long, lId: Long, score: Double)

  /** (precision, recall) at every distinct score threshold, sweeping from
    * the most to the least confident. Ties in score enter together.
    */
  def prPoints(scored: Seq[Scored], gt: Map[Long, Long], gtTotal: Int): Vector[(Double, Double)] = {
    if (scored.isEmpty || gtTotal == 0) return Vector.empty
    val sorted = scored.sortBy(s => (-s.score, s.rId))
    val out = Vector.newBuilder[(Double, Double)]
    var correct = 0
    var n = 0
    var i = 0
    while (i < sorted.length) {
      var j = i
      while (j < sorted.length && sorted(j).score == sorted(i).score) {
        val s = sorted(j)
        n += 1
        if (gt.get(s.rId).contains(s.lId)) correct += 1
        j += 1
      }
      out += ((correct.toDouble / n, correct.toDouble / gtTotal))
      i = j
    }
    out.result()
  }

  /** Adjusted Recall (§5.1.2): the recall at the sweep point whose
    * precision is closest to but not greater than `targetPrecision`; if no
    * point qualifies (the method is more precise than the target
    * everywhere), the most-recall point is reported — both readings favor
    * the baseline, as in the paper.
    */
  def adjustedRecall(
      scored: Seq[Scored],
      gt: Map[Long, Long],
      gtTotal: Int,
      targetPrecision: Double,
  ): Double = {
    val pts = prPoints(scored, gt, gtTotal)
    if (pts.isEmpty) return 0.0
    val eligible = pts.filter(_._1 <= targetPrecision)
    if (eligible.isEmpty) pts.map(_._2).max
    else {
      val bestP = eligible.map(_._1).max
      eligible.filter(_._1 == bestP).map(_._2).max
    }
  }

  /** PR-AUC as average precision: Σ (R_k − R_{k−1}) · P_k over the sweep. */
  def prAuc(scored: Seq[Scored], gt: Map[Long, Long], gtTotal: Int): Double = {
    val pts = prPoints(scored, gt, gtTotal)
    var auc = 0.0
    var prevR = 0.0
    pts.foreach { case (p, r) => auc += (r - prevR) * p; prevR = r }
    auc
  }

  /** Pearson correlation coefficient; NaN-free (0 on degenerate input). */
  def pearson(xs: Seq[Double], ys: Seq[Double]): Double = {
    require(xs.length == ys.length)
    val n = xs.length
    if (n < 2) return 0.0
    val mx = xs.sum / n; val my = ys.sum / n
    var sxy = 0.0; var sxx = 0.0; var syy = 0.0
    var i = 0
    while (i < n) {
      val dx = xs(i) - mx; val dy = ys(i) - my
      sxy += dx * dy; sxx += dx * dx; syy += dy * dy
      i += 1
    }
    if (sxx == 0.0 || syy == 0.0) 0.0 else sxy / math.sqrt(sxx * syy)
  }

  /** Upper-tailed paired t-test p-value for H0 "mean(diffs) ≤ 0": the
    * probability of T_{n-1} exceeding the observed statistic.
    */
  def upperTailPairedTTest(diffs: Seq[Double]): Double = {
    val n = diffs.length
    require(n >= 2, "need at least two paired observations")
    val mean = diffs.sum / n
    val varr = diffs.map(d => (d - mean) * (d - mean)).sum / (n - 1)
    if (varr == 0.0) return if (mean > 0) 0.0 else 1.0
    val t = mean / math.sqrt(varr / n)
    1.0 - studentTCdf(t, n - 1)
  }

  /** CDF of Student's t with `df` degrees of freedom. */
  def studentTCdf(t: Double, df: Int): Double = {
    val x = df / (df + t * t)
    val ib = regularizedIncompleteBeta(df / 2.0, 0.5, x)
    if (t >= 0) 1.0 - 0.5 * ib else 0.5 * ib
  }

  /** Regularized incomplete beta I_x(a, b) via the Lentz continued
    * fraction (Numerical Recipes betai/betacf).
    */
  def regularizedIncompleteBeta(a: Double, b: Double, x: Double): Double = {
    require(x >= 0.0 && x <= 1.0, s"x=$x out of [0,1]")
    if (x == 0.0) return 0.0
    if (x == 1.0) return 1.0
    val lbeta = logGamma(a + b) - logGamma(a) - logGamma(b) +
      a * math.log(x) + b * math.log(1.0 - x)
    val front = math.exp(lbeta)
    if (x < (a + 1.0) / (a + b + 2.0)) front * betacf(a, b, x) / a
    else 1.0 - math.exp(logGamma(a + b) - logGamma(b) - logGamma(a) +
      b * math.log(1.0 - x) + a * math.log(x)) * betacf(b, a, 1.0 - x) / b
  }

  private def betacf(a: Double, b: Double, x: Double): Double = {
    val MaxIter = 300; val Eps = 3e-14; val FpMin = 1e-300
    val qab = a + b; val qap = a + 1.0; val qam = a - 1.0
    var c = 1.0
    var d = 1.0 - qab * x / qap
    if (math.abs(d) < FpMin) d = FpMin
    d = 1.0 / d
    var h = d
    var m = 1
    while (m <= MaxIter) {
      val m2 = 2 * m
      var aa = m * (b - m) * x / ((qam + m2) * (a + m2))
      d = 1.0 + aa * d; if (math.abs(d) < FpMin) d = FpMin
      c = 1.0 + aa / c; if (math.abs(c) < FpMin) c = FpMin
      d = 1.0 / d
      h *= d * c
      aa = -(a + m) * (qab + m) * x / ((a + m2) * (qap + m2))
      d = 1.0 + aa * d; if (math.abs(d) < FpMin) d = FpMin
      c = 1.0 + aa / c; if (math.abs(c) < FpMin) c = FpMin
      d = 1.0 / d
      val del = d * c
      h *= del
      if (math.abs(del - 1.0) < Eps) return h
      m += 1
    }
    h
  }

  /** Lanczos log-gamma. */
  def logGamma(xx: Double): Double = {
    val cof = Array(76.18009172947146, -86.50532032941677, 24.01409824083091,
      -1.231739572450155, 0.1208650973866179e-2, -0.5395239384953e-5)
    var x = xx; var y = xx
    var tmp = x + 5.5
    tmp -= (x + 0.5) * math.log(tmp)
    var ser = 1.000000000190015
    var j = 0
    while (j < 6) { y += 1.0; ser += cof(j) / y; j += 1 }
    -tmp + math.log(2.5066282746310005 * ser / x)
  }
}
