package repro.core

/** The space of join functions (Table 1) and join configurations.
  *
  * A join function f = (P, T, W, D) is identified by a dense integer id in
  * [0, 140):
  *
  *   - ids   0..7   character-based: 4 preprocessing combos × {JW, ED}
  *   - ids   8..135 set-based: 4 P × 2 T × 2 W × 8 D
  *   - ids 136..139 embedding-based (GED): 4 P
  *
  * which matches the paper's count 4·2 + 4·2·2·8 + 4·1 = 140. A join
  * configuration C = ⟨f, θ⟩ pairs a function id with a threshold from the
  * discretized grid (s = 50 steps over the normalized [0, 1] range).
  */
object ConfigSpace {

  val CharDistCodes: Vector[String] = Vector("JW", "ED")
  val SetDistCodes: Vector[String] =
    Vector("JD", "CD", "MD", "DD", "ID", "CJD", "CCD", "CDD")

  val NumPreproc = 4
  val NumTok = 2
  val NumWeight = 2
  val NumSetDist = 8
  val NumCharDist = 2

  val CharBase = 0
  val SetBase: Int = NumPreproc * NumCharDist // 8
  val EmbedBase: Int = SetBase + NumPreproc * NumTok * NumWeight * NumSetDist // 136
  val Size: Int = EmbedBase + NumPreproc // 140

  /** Kind of join function: 0 = character, 1 = set, 2 = embedding. */
  sealed trait Kind
  case object CharKind extends Kind
  case object SetKind extends Kind
  case object EmbedKind extends Kind

  /** A fully decoded join function. `t`, `w` are -1 for non-set kinds. */
  final case class JoinFunction(id: Int, kind: Kind, p: Int, t: Int, w: Int, d: Int) {
    def label: String = kind match {
      case CharKind  => s"(${Preprocess.Codes(p)},${CharDistCodes(d)})"
      case SetKind   => s"(${Preprocess.Codes(p)},${Tokenize.Codes(t)},${TokenWeights.Codes(w)},${SetDistCodes(d)})"
      case EmbedKind => s"(${Preprocess.Codes(p)},GED)"
    }
  }

  def charId(p: Int, d: Int): Int = CharBase + p * NumCharDist + d
  def setId(p: Int, t: Int, w: Int, d: Int): Int =
    SetBase + ((p * NumTok + t) * NumWeight + w) * NumSetDist + d
  def embedId(p: Int): Int = EmbedBase + p

  def decode(id: Int): JoinFunction = {
    require(id >= 0 && id < Size, s"join function id $id out of range")
    if (id < SetBase) {
      JoinFunction(id, CharKind, id / NumCharDist, -1, -1, id % NumCharDist)
    } else if (id < EmbedBase) {
      val x = id - SetBase
      val d = x % NumSetDist
      val w = (x / NumSetDist) % NumWeight
      val t = (x / (NumSetDist * NumWeight)) % NumTok
      val p = x / (NumSetDist * NumWeight * NumTok)
      JoinFunction(id, SetKind, p, t, w, d)
    } else {
      JoinFunction(id, EmbedKind, id - EmbedBase, -1, -1, -1)
    }
  }

  /** All 140 join functions. */
  val full: Vector[JoinFunction] = (0 until Size).map(decode).toVector

  /** The reduced 24-function space of Table 6: preprocessing restricted to
    * {L, L+S+RP}; character distances kept (2·2 = 4); set distances
    * restricted to the five standard ones over space tokens with both
    * weightings (2·1·2·5 = 20). The paper does not publish the exact
    * composition of its 24; this one follows its reduction recipe
    * ("removing some options for the 4 parameters").
    */
  val reduced24: Vector[Int] = {
    val ps = Vector(0, 3)
    val chars = for (p <- ps; d <- 0 until NumCharDist) yield charId(p, d)
    val sets = for (p <- ps; w <- 0 until NumWeight; d <- 0 until 5) yield setId(p, 1, w, d)
    (chars ++ sets).toVector.sorted
  }

  /** Threshold grid: s equal steps over (0, 1]. */
  def thresholds(s: Int = 50): Array[Double] = Array.tabulate(s)(k => (k + 1).toDouble / s)

  /** A join configuration ⟨f, θ⟩. */
  final case class JoinConfig(fId: Int, theta: Double) {
    def label: String = s"${decode(fId).label} ≤ ${f"$theta%.2f"}"
  }
}
