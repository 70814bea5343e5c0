package repro.data

import scala.util.Random

/** A multi-column fuzzy-join task (substitute for the 8 Magellan benchmark
  * datasets of Table 3 — see DESIGN.md §3). Missing values are empty
  * strings, per §5.2.2.
  */
final case class MultiTask(
    name: String,
    domain: String,
    columns: Vector[String],
    left: Vector[(Long, Vector[String])],
    right: Vector[(Long, Vector[String])],
    gt: Map[Long, Long],
) {
  def gtTotal: Int = gt.size
  def nCols: Int = columns.length
}

/** Generator for the synthetic multi-column datasets. Each column is
  * described by how its L value derives from the entity and how a matched
  * R value perturbs it; non-matching R rows come from entities absent
  * from L.
  */
object MultiColGen {

  /** One column: `gen` builds the L value for entity `i`; `perturbR` builds
    * the matched-R value from the L value; `missL`/`missR` are independent
    * missing-value rates.
    */
  final case class Col(
      name: String,
      gen: (Int, Random) => String,
      perturbR: (String, Random) => String,
      missL: Double = 0.0,
      missR: Double = 0.0,
  )

  final case class MultiSpec(
      name: String,
      domain: String,
      seed: Long,
      nL: Int,
      nExtra: Int,
      nMatches: Int,
      nNonMatches: Int,
      cols: Vector[Col],
  )

  // ----------------------------------------------------- value builders

  private def words(rng: Random, n: Int): String =
    (0 until n).map(_ => BenchmarkGen.syllableWord(rng, 1 + rng.nextInt(2)).capitalize).mkString(" ")

  private def digits(rng: Random, n: Int): String =
    (0 until n).map(_ => rng.nextInt(10)).mkString

  /** Heavy perturbation: typo + possible token drop. */
  private def fuzz(s: String, rng: Random): String = {
    var out = s
    if (out.isEmpty) return out
    val toks = out.split(" ")
    if (toks.length >= 3 && rng.nextDouble() < 0.3)
      out = toks.patch(rng.nextInt(toks.length), Nil, 1).mkString(" ")
    if (rng.nextDouble() < 0.6) out = charTypo(out, rng)
    out
  }

  private def charTypo(s: String, rng: Random): String = {
    if (s.length < 3) return s
    val pos = 1 + rng.nextInt(s.length - 2)
    rng.nextInt(3) match {
      case 0 => s.substring(0, pos) + s.substring(pos + 1)
      case 1 => s.substring(0, pos) + ('a' + rng.nextInt(26)).toChar + s.substring(pos + 1)
      case _ => s.substring(0, pos) + ('a' + rng.nextInt(26)).toChar + s.substring(pos)
    }
  }

  private def lightFuzz(s: String, rng: Random): String =
    if (rng.nextDouble() < 0.15) charTypo(s, rng) else s

  private def keep(s: String, rng: Random): String = s

  /** A column carrying no match signal: value independent of the entity. */
  private def noiseCol(name: String, nWords: Int): Col =
    Col(name, (_, rng) => words(rng, nWords), (_, rng) => words(rng, nWords))

  private def categoryCol(name: String, values: Vector[String], stable: Boolean): Col =
    Col(name,
      (i, rng) => values(rng.nextInt(values.length)),
      if (stable) keep else (_, rng) => values(rng.nextInt(values.length)))

  private def numberCol(name: String, lo: Int, hi: Int, jitter: Int): Col =
    Col(name,
      (_, rng) => (lo + rng.nextInt(hi - lo)).toString,
      (s, rng) => if (jitter == 0) s
                  else (s.toInt + rng.nextInt(2 * jitter + 1) - jitter).toString)

  // ------------------------------------------------------------- specs

  /** The 8 dataset specs mirroring Table 3's domains and shapes (scaled to
    * single-machine bench budgets). In each, the paper's "selected
    * columns" carry the stable match signal.
    */
  val specs: Vector[MultiSpec] = Vector(
    MultiSpec("FZ", "Restaurant", 201, nL = 520, nExtra = 120, nMatches = 110, nNonMatches = 210, Vector(
      Col("name", (i, rng) => words(rng, 2) + " " + Vector("Grill", "Cafe", "Bistro", "Diner")(rng.nextInt(4)), fuzz),
      Col("addr", (i, rng) => s"${100 + rng.nextInt(900)} ${words(rng, 1)} St", fuzz),
      categoryCol("city", Vector("new york", "los angeles", "atlanta", "san francisco"), stable = false),
      Col("phone", (i, rng) => s"${digits(rng, 3)}-${digits(rng, 3)}-${digits(rng, 4)}", lightFuzz),
      categoryCol("type", Vector("american", "italian", "asian", "french", "bbq"), stable = false),
      Col("class", (i, rng) => s"cls${i}${digits(rng, 2)}", keep),
    )),
    MultiSpec("DA", "Citation", 202, nL = 1000, nExtra = 180, nMatches = 820, nNonMatches = 120, Vector(
      Col("title", (i, rng) => words(rng, 5 + rng.nextInt(3)), lightFuzz),
      Col("authors", (i, rng) => words(rng, 4), fuzz, missR = 0.1),
      categoryCol("venue", Vector("SIGMOD", "VLDB", "ICDE", "KDD", "WWW"), stable = false),
      numberCol("year", 1995, 2020, jitter = 0),
    )),
    MultiSpec("AB", "Product", 203, nL = 700, nExtra = 250, nMatches = 380, nNonMatches = 300, Vector(
      Col("name", (i, rng) => words(rng, 3) + " " + digits(rng, 4).toUpperCase, fuzz),
      noiseCol("description", 10),
      numberCol("price", 20, 900, jitter = 30),
    )),
    MultiSpec("RI", "Movie", 204, nL = 1300, nExtra = 120, nMatches = 180, nNonMatches = 75, Vector(
      Col("name", (i, rng) => words(rng, 2 + rng.nextInt(2)), lightFuzz),
      numberCol("year", 1960, 2020, jitter = 1),
      Col("director", (i, rng) => words(rng, 2), lightFuzz, missR = 0.05),
      Col("creators", (i, rng) => words(rng, 3), fuzz, missR = 0.25),
      Col("cast", (i, rng) => words(rng, 6), fuzz, missR = 0.2),
      categoryCol("genre", Vector("Drama", "Comedy", "Action", "Horror", "Documentary"), stable = false),
      numberCol("duration", 70, 200, jitter = 25),
      categoryCol("rating", Vector("G", "PG", "PG-13", "R"), stable = false),
      noiseCol("description", 12),
      noiseCol("reviews", 8),
    )),
    MultiSpec("BR", "Beer", 205, nL = 850, nExtra = 130, nMatches = 70, nNonMatches = 190, Vector(
      Col("beer_name", (i, rng) => words(rng, 2 + rng.nextInt(2)), lightFuzz),
      Col("factory_name", (i, rng) => words(rng, 2) + " Brewing", fuzz),
      categoryCol("style", Vector("IPA", "Stout", "Lager", "Pilsner", "Porter", "Ale"), stable = false),
      Col("abv", (i, rng) => f"${3.0 + rng.nextDouble() * 9}%.1f", (s, rng) => s),
    )),
    MultiSpec("ABN", "Book", 206, nL = 900, nExtra = 140, nMatches = 230, nNonMatches = 120, Vector(
      Col("title", (i, rng) => words(rng, 4 + rng.nextInt(3)), lightFuzz),
      Col("authors", (i, rng) => words(rng, 2), fuzz, missR = 0.1),
      numberCol("pubyear", 1970, 2020, jitter = 2),
      Col("pages", (i, rng) => (80 + rng.nextInt(900)).toString, keep),
      Col("publisher", (i, rng) => words(rng, 2) + " Press", fuzz, missR = 0.2),
      categoryCol("lang", Vector("English", "French", "German", "Spanish"), stable = false),
      Col("isbn", (i, rng) => digits(rng, 13), lightFuzz, missL = 0.3, missR = 0.4),
      categoryCol("edition", Vector("1st", "2nd", "3rd", "Revised"), stable = false),
      numberCol("price", 5, 120, jitter = 10),
      categoryCol("binding", Vector("Hardcover", "Paperback"), stable = false),
      noiseCol("series", 2),
    )),
    MultiSpec("IA", "Music", 207, nL = 1100, nExtra = 150, nMatches = 130, nNonMatches = 330, Vector(
      Col("song_name", (i, rng) => words(rng, 2 + rng.nextInt(3)), lightFuzz),
      Col("artist", (i, rng) => words(rng, 2), fuzz, missR = 0.15),
      Col("album", (i, rng) => words(rng, 3), fuzz, missR = 0.2),
      categoryCol("genre", Vector("Pop", "Rock", "Jazz", "Hip-Hop", "Country", "Electronic"), stable = true),
      numberCol("price", 1, 3, jitter = 1),
      noiseCol("copyright", 5),
      Col("time", (i, rng) => s"${2 + rng.nextInt(5)}:${10 + rng.nextInt(50)}", (s, rng) => s),
      numberCol("released", 1990, 2020, jitter = 1),
    )),
    MultiSpec("BB", "Baby Product", 208, nL = 1300, nExtra = 120, nMatches = 105, nNonMatches = 175, Vector(
      Col("title", (i, rng) => words(rng, 4 + rng.nextInt(3)), lightFuzz),
      numberCol("price", 10, 300, jitter = 20),
      categoryCol("is_discounted", Vector("0", "1"), stable = false),
      categoryCol("category", Vector("Strollers", "Car Seats", "Bedding", "Feeding", "Bath"), stable = false),
      Col("company_struct", (i, rng) => words(rng, 2) + " Inc.", lightFuzz),
      Col("company_free", (i, rng) => words(rng, 2), fuzz, missL = 0.3, missR = 0.4),
      Col("brand", (i, rng) => words(rng, 1), fuzz, missR = 0.3),
      numberCol("weight", 1, 40, jitter = 3),
      numberCol("length", 5, 60, jitter = 4),
      numberCol("width", 5, 50, jitter = 4),
      numberCol("height", 5, 50, jitter = 4),
      categoryCol("fabrics", Vector("cotton", "polyester", "plastic", "wood"), stable = false),
      categoryCol("colors", Vector("red", "blue", "green", "pink", "grey", "white"), stable = false),
      categoryCol("materials", Vector("metal", "plastic", "fabric", "wood"), stable = false),
      Col("item_num", (i, rng) => digits(rng, 8), (s, rng) => if (rng.nextBoolean()) s else digits(rng, 8)),
      categoryCol("shipping", Vector("standard", "express", "free"), stable = false),
    )),
  )

  /** Generate one multi-column task. Right ids start at 1,000,000. */
  def generate(spec: MultiSpec): MultiTask = {
    val rng = new Random(spec.seed)
    val nTotal = spec.nL + spec.nExtra
    // Per-entity L-side tuples (missing applied on the L side only here).
    val tuples: Vector[Vector[String]] =
      Vector.tabulate(nTotal)(i => spec.cols.map(c => c.gen(i, rng)))
    val left = Vector.tabulate(spec.nL) { i =>
      val vals = spec.cols.zipWithIndex.map { case (c, j) =>
        if (rng.nextDouble() < c.missL) "" else tuples(i)(j)
      }
      (i.toLong, vals)
    }
    val right = Vector.newBuilder[(Long, Vector[String])]
    val gt = Map.newBuilder[Long, Long]
    var rid = 1000000L
    // Matched rows: perturbations of entities present in L.
    var j = 0
    while (j < spec.nMatches) {
      val e = rng.nextInt(spec.nL)
      val vals = spec.cols.zipWithIndex.map { case (c, k) =>
        if (rng.nextDouble() < c.missR) "" else c.perturbR(tuples(e)(k), rng)
      }
      right += ((rid, vals))
      gt += rid -> e.toLong
      rid += 1; j += 1
    }
    // Non-matching rows: entities not in L.
    j = 0
    while (j < spec.nNonMatches) {
      val e = spec.nL + rng.nextInt(spec.nExtra)
      val vals = spec.cols.zipWithIndex.map { case (c, k) =>
        if (rng.nextDouble() < c.missR) "" else c.perturbR(tuples(e)(k), rng)
      }
      right += ((rid, vals))
      rid += 1; j += 1
    }
    MultiTask(spec.name, spec.domain, spec.cols.map(_.name), left, right.result(), gt.result())
  }

  /** Table 4(b) robustness: append `n` random-string columns (length 10–50)
    * to both sides of a task.
    */
  def addRandomColumns(task: MultiTask, n: Int, seed: Long): MultiTask = {
    val rng = new Random(seed)
    def randStr(): String = {
      val len = 10 + rng.nextInt(41)
      (0 until len).map(_ => ('a' + rng.nextInt(26)).toChar).mkString
    }
    MultiTask(
      task.name + "+rand",
      task.domain,
      task.columns ++ (1 to n).map(i => s"rand$i"),
      task.left.map { case (id, v) => (id, v ++ Vector.fill(n)(randStr())) },
      task.right.map { case (id, v) => (id, v ++ Vector.fill(n)(randStr())) },
      task.gt,
    )
  }
}
