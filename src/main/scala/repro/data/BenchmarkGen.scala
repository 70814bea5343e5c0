package repro.data

import scala.util.Random

/** A single-column fuzzy-join task: reference table L, input table R, and
  * ground truth. `gt` maps rId → lId only for right records whose true
  * entity is present in L (records of removed entities have J_G(r) = ⊥;
  * joining them is always a false positive).
  */
final case class SingleTask(
    name: String,
    left: Vector[(Long, String)],
    right: Vector[(Long, String)],
    gt: Map[Long, Long],
) {
  /** |{r : J_G(r) ≠ ∅}| — the normalized-recall denominator. */
  def gtTotal: Int = gt.size
}

/** Knobs of one synthetic benchmark task (substitute for one DBPedia
  * entity-type dataset — see DESIGN.md §3). Probabilities are per-op;
  * perturbation retries until the variant differs from every reference
  * name, mirroring the paper's removal of trivial equi-joins.
  */
final case class TaskSpec(
    name: String,
    seed: Long,
    family: Family,
    nL: Int,
    nExtra: Int,
    nR: Int,
    typo: Double = 0.4,
    drop: Double = 0.2,
    add: Double = 0.05,
    swap: Double = 0.05,
    synonym: Double = 0.15,
    abbrev: Double = 0.0,
    alias: Double = 0.0,
    /** For entities absent from L: probability that R carries their name
      * verbatim (the DBPedia regime — a new snapshot's entity missing from
      * the older reference table lands one identifier-word away from a
      * sibling, the false positive that 2d-balls and negative rules must
      * block; Figure 3(a)'s (l6, r6) / (l7, r7)).
      */
    missingExact: Double = 0.4,
)

/** A template family: generates distinct entity names and family-specific
  * perturbation vocabulary. Families mirror the fuzzy structure of the
  * paper's entity types (grid-like team seasons, roman-numeral events,
  * people, organizations, codes, titles).
  */
sealed trait Family {
  /** `n` distinct entity surface names, deterministic in `rng`. */
  def entities(n: Int, rng: Random): Vector[String]
  /** Filler words the `add` op may insert. */
  def fillers: Vector[String] = Vector("the", "official")
  /** Token synonym substitutions the `synonym` op may apply. */
  def synonyms: Map[String, String] = Map.empty
  /** An unrelated alias (semantic match infeasible for fuzzy join). */
  def alias(rng: Random): String =
    "Alias " + BenchmarkGen.syllableWord(rng, 3).capitalize + " " + rng.nextInt(10000)
}

object Family {

  private val Schools = Vector(
    "LSU" -> "Tigers", "Wisconsin" -> "Badgers", "Mississippi State" -> "Bulldogs",
    "Auburn" -> "Eagles", "Michigan" -> "Wolverines", "Oregon" -> "Ducks",
    "Kansas" -> "Jayhawks", "Baylor" -> "Bears", "Clemson" -> "Paladins",
    "Stanford" -> "Cardinals", "Arkansas" -> "Razorbacks", "Kentucky" -> "Wildcats",
    "Iowa" -> "Hawkeyes", "Nebraska" -> "Cornhuskers", "Purdue" -> "Boilermakers",
    "Tulane" -> "Pelicans", "Vermont" -> "Catamounts", "Wyoming" -> "Broncos",
  )
  private val Sports = Vector("football", "baseball", "basketball", "soccer", "hockey")

  /** "{year} {school} {mascot} {sport} team" on a (year × school × sport)
    * grid — the Figure 3(a) regime: dense sibling structure feeding the
    * 2d-ball estimator and the negative-rule learner.
    */
  case object TeamSeason extends Family {
    def entities(n: Int, rng: Random): Vector[String] = {
      val cells = for {
        year <- 1995 to 2019
        (school, mascot) <- Schools
        sport <- Sports
      } yield s"$year $school $mascot $sport team"
      rng.shuffle(cells.toVector).take(n)
    }
    override def synonyms: Map[String, String] = Map("team" -> "season")
  }

  /** "{series} {roman} {suffix}" — the Figure 3(b) regime where even
    * ED ≤ 1 is unsafe (adjacent roman numerals).
    */
  case object RomanEvent extends Family {
    private val Series = Vector("Super Bowl", "Grand Final", "Champions Cup", "World Series")
    def entities(n: Int, rng: Random): Vector[String] = {
      val cells = for {
        s <- Series
        i <- 1 to 80
      } yield s"$s ${BenchmarkGen.roman(i)} Championship Game"
      rng.shuffle(cells.toVector).take(n)
    }
    override def synonyms: Map[String, String] = Map("Game" -> "game")
  }

  /** "{first} {last}" people; `abbrev` produces "J. Smith" style variants;
    * aliases model ("Lita (wrestler)", "Amy Dumas") infeasible pairs.
    */
  case object Person extends Family {
    private val First = Vector("James", "Mary", "Robert", "Patricia", "John", "Jennifer",
      "Michael", "Linda", "David", "Elizabeth", "William", "Barbara", "Richard", "Susan",
      "Joseph", "Jessica", "Thomas", "Sarah", "Charles", "Karen", "Christopher", "Nancy",
      "Daniel", "Lisa", "Matthew", "Betty", "Anthony", "Margaret", "Mark", "Sandra")
    private val Last = Vector("Smith", "Johnson", "Williams", "Brown", "Jones", "Garcia",
      "Miller", "Davis", "Rodriguez", "Martinez", "Hernandez", "Lopez", "Gonzalez",
      "Wilson", "Anderson", "Thomas", "Taylor", "Moore", "Jackson", "Martin", "Lee",
      "Perez", "Thompson", "White", "Harris", "Sanchez", "Clark", "Ramirez", "Lewis",
      "Robinson", "Walker", "Young", "Allen", "King", "Wright", "Scott", "Torres")
    def entities(n: Int, rng: Random): Vector[String] = {
      val cells = for (f <- First; l <- Last) yield s"$f $l"
      rng.shuffle(cells.toVector).take(n)
    }
  }

  /** "{name} {numeral} of {place}" — monarchs/bishops: roman numerals again
    * plus a distinguishing place suffix.
    */
  case object Monarch extends Family {
    private val Names = Vector("Henry", "Edward", "Charles", "Louis", "Philip", "Frederick",
      "Otto", "Alfonso", "Casimir", "Boleslaw", "Harald", "Magnus")
    private val Places = Vector("England", "France", "Castile", "Aragon", "Sweden",
      "Denmark", "Poland", "Bavaria", "Saxony", "Navarre")
    def entities(n: Int, rng: Random): Vector[String] = {
      val cells = for {
        nm <- Names; i <- 1 to 12; p <- Places
      } yield s"$nm ${BenchmarkGen.roman(i)} of $p"
      rng.shuffle(cells.toVector).take(n)
    }
  }

  /** Organizations: "Saint {name} {kind} of {city}" with punctuation and
    * abbreviation variants ("Saint" → "St.").
    */
  case object Org extends Family {
    private val Saints = Vector("Mary", "Joseph", "Vincent", "Luke", "Agnes", "Francis",
      "Jude", "Catherine", "Anthony", "Michael")
    private val Kinds = Vector("Hospital", "Medical Center", "Academy", "College", "Institute")
    private val Cities = Vector("Springfield", "Riverton", "Lakewood", "Fairview",
      "Georgetown", "Madison", "Clinton", "Salem", "Bristol", "Dover", "Milton", "Ashland",
      "Brookfield", "Oakdale", "Winfield", "Hartley")
    def entities(n: Int, rng: Random): Vector[String] = {
      val cells = for (s <- Saints; k <- Kinds; c <- Cities) yield s"Saint $s $k of $c"
      rng.shuffle(cells.toVector).take(n)
    }
    override def synonyms: Map[String, String] = Map("Saint" -> "St.")
  }

  /** Code-like names: "{word} {number}" (drugs, satellites). High alias
    * rates model brand-vs-chemical name pairs out of fuzzy-join reach.
    */
  case object Code extends Family {
    def entities(n: Int, rng: Random): Vector[String] = {
      val out = scala.collection.mutable.LinkedHashSet.empty[String]
      while (out.size < n) {
        out += BenchmarkGen.syllableWord(rng, 2 + rng.nextInt(2)).capitalize +
          " " + (100 + rng.nextInt(900))
      }
      out.toVector
    }
  }

  /** "{Title} ({artist} song)" — parenthetical disambiguation that variants
    * often drop (containment-style matches).
    */
  case object TitleParen extends Family {
    private val Artists = Vector("Harmony", "Vega", "Orion", "Calypso", "Nimbus",
      "Aster", "Juniper", "Sable")
    def entities(n: Int, rng: Random): Vector[String] = {
      val out = scala.collection.mutable.LinkedHashSet.empty[String]
      while (out.size < n) {
        val title = (0 until (2 + rng.nextInt(2)))
          .map(_ => BenchmarkGen.syllableWord(rng, 2).capitalize).mkString(" ")
        out += s"$title (${Artists(rng.nextInt(Artists.length))} song)"
      }
      out.toVector
    }
  }

  /** "{city} {branch} railway station" grids (stations, stadiums, lines). */
  case object Station extends Family {
    private val Cities = Vector("Northfield", "Eastbrook", "Westgate", "Southport",
      "Harborview", "Stonebridge", "Maplewood", "Cedar Falls", "Elk Grove", "Pine Hill",
      "Foxton", "Greendale", "Ironville", "Kingsford", "Larkspur", "Moorland")
    private val Branches = Vector("Central", "North", "South", "East", "West",
      "Junction", "Park", "Bridge", "Market", "Harbour")
    def entities(n: Int, rng: Random): Vector[String] = {
      val cells = for (c <- Cities; b <- Branches) yield s"$c $b railway station"
      rng.shuffle(cells.toVector).take(n)
    }
    override def synonyms: Map[String, String] = Map("station" -> "stop")
  }
}

/** Deterministic generator for synthetic fuzzy-join benchmark tasks. */
object BenchmarkGen {

  private val Syllables = Vector("za", "ni", "trex", "lor", "mi", "dol", "ke", "ran",
    "vus", "pel", "tor", "gan", "bex", "ulo", "quin", "far", "sel", "dra", "nov", "lex")

  def syllableWord(rng: Random, n: Int): String =
    (0 until n).map(_ => Syllables(rng.nextInt(Syllables.length))).mkString

  def roman(n: Int): String = {
    val vals = Vector(100 -> "C", 90 -> "XC", 50 -> "L", 40 -> "XL", 10 -> "X",
      9 -> "IX", 5 -> "V", 4 -> "IV", 1 -> "I")
    var rem = n; val sb = new StringBuilder
    vals.foreach { case (v, sym) => while (rem >= v) { sb.append(sym); rem -= v } }
    sb.toString
  }

  // ------------------------------------------------------- perturbations

  private def typo(rng: Random, s: String): String = {
    val toks = s.split(" ")
    val idxs = toks.indices.filter(toks(_).length >= 4)
    if (idxs.isEmpty) return s
    val ti = idxs(rng.nextInt(idxs.length))
    val w = toks(ti)
    val pos = 1 + rng.nextInt(w.length - 2)
    val out = rng.nextInt(4) match {
      case 0 => w.substring(0, pos) + w.substring(pos + 1) // delete
      case 1 => w.substring(0, pos) + ('a' + rng.nextInt(26)).toChar + w.substring(pos + 1) // substitute
      case 2 => w.substring(0, pos) + ('a' + rng.nextInt(26)).toChar + w.substring(pos) // insert
      case _ => // transpose
        if (pos + 1 < w.length)
          w.substring(0, pos) + w.charAt(pos + 1) + w.charAt(pos) + w.substring(pos + 2)
        else w.substring(0, pos - 1) + w.charAt(pos) + w.charAt(pos - 1)
    }
    toks.updated(ti, out).mkString(" ")
  }

  private def dropToken(rng: Random, s: String): String = {
    val toks = s.split(" ")
    if (toks.length < 3) s
    else toks.patch(rng.nextInt(toks.length), Nil, 1).mkString(" ")
  }

  private def addToken(rng: Random, s: String, fillers: Vector[String]): String = {
    val toks = s.split(" ")
    val pos = rng.nextInt(toks.length + 1)
    toks.patch(pos, Seq(fillers(rng.nextInt(fillers.length))), 0).mkString(" ")
  }

  private def swapTokens(rng: Random, s: String): String = {
    val toks = s.split(" ")
    if (toks.length < 2) s
    else {
      val i = rng.nextInt(toks.length - 1)
      (toks.take(i) ++ Array(toks(i + 1), toks(i)) ++ toks.drop(i + 2)).mkString(" ")
    }
  }

  private def applySynonym(rng: Random, s: String, syn: Map[String, String]): String =
    s.split(" ").map(t => syn.getOrElse(t, t)).mkString(" ")

  private def abbrevToken(rng: Random, s: String): String = {
    val toks = s.split(" ")
    val idxs = toks.indices.filter(i => toks(i).length >= 4 && toks(i).head.isUpper)
    if (idxs.isEmpty) s
    else {
      val i = idxs(rng.nextInt(idxs.length))
      toks.updated(i, toks(i).head.toString + ".").mkString(" ")
    }
  }

  /** One perturbed variant, guaranteed different from `name` and colliding
    * with no other reference entity (the paper drops trivial equi-joins;
    * a typo that lands exactly on a sibling's name would corrupt the GT).
    */
  def perturb(rng: Random, name: String, spec: TaskSpec, taken: Set[String]): String = {
    var attempt = 0
    while (attempt < 20) {
      var s = name
      if (rng.nextDouble() < spec.synonym) s = applySynonym(rng, s, spec.family.synonyms)
      if (rng.nextDouble() < spec.drop) s = dropToken(rng, s)
      if (rng.nextDouble() < spec.add) s = addToken(rng, s, spec.family.fillers)
      if (rng.nextDouble() < spec.swap) s = swapTokens(rng, s)
      if (rng.nextDouble() < spec.abbrev) s = abbrevToken(rng, s)
      if (rng.nextDouble() < spec.typo || s == name) s = typo(rng, s)
      if (s != name && s.nonEmpty && !taken.contains(s)) return s
      attempt += 1
    }
    name + " x" // deterministic fallback, still a non-equi variant
  }

  /** Generate one task. Right ids start at 1,000,000 to stay disjoint from
    * left ids (0-based entity indices).
    */
  def generate(spec: TaskSpec): SingleTask = {
    val rng = new Random(spec.seed)
    val nTotal = spec.nL + spec.nExtra
    val names = spec.family.entities(nTotal, rng)
    require(names.length == nTotal, s"${spec.name}: family pool too small (${names.length} < $nTotal)")
    val nameSet = names.toSet
    val left = names.take(spec.nL).zipWithIndex.map { case (n, i) => (i.toLong, n) }
    val gt = Map.newBuilder[Long, Long]
    val right = Vector.newBuilder[(Long, String)]
    var j = 0
    while (j < spec.nR) {
      val e = rng.nextInt(nTotal)
      val rid = 1000000L + j
      val text =
        if (e >= spec.nL && rng.nextDouble() < spec.missingExact) names(e)
        else if (rng.nextDouble() < spec.alias) spec.family.alias(rng)
        else perturb(rng, names(e), spec, nameSet)
      right += ((rid, text))
      if (e < spec.nL) gt += rid -> e.toLong
      j += 1
    }
    SingleTask(spec.name, left, right.result(), gt.result())
  }
}
