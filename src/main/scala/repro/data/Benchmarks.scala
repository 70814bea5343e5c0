package repro.data

/** The benchmark suites: 20 single-column tasks standing in for the
  * paper's 50 DBPedia tasks (same fuzzy structure, documented in DESIGN.md
  * §3), and knobs for quick unit-test-sized variants.
  */
object Benchmarks {

  import Family._

  /** The single-column suite used by Table 2 / 5 / 6 benches. Names echo
    * the paper's entity types whose fuzzy structure each task mirrors.
    */
  val singleColumn: Vector[TaskSpec] = Vector(
    TaskSpec("NCAATeamSeason", 101, TeamSeason, nL = 800, nExtra = 120, nR = 220,
      typo = 0.35, drop = 0.25, synonym = 0.25),
    TaskSpec("FootballLeagueSeason", 102, TeamSeason, nL = 500, nExtra = 80, nR = 150,
      typo = 0.30, drop = 0.30, synonym = 0.20),
    TaskSpec("SoccerClubSeason", 103, TeamSeason, nL = 300, nExtra = 40, nR = 80,
      typo = 0.25, drop = 0.40, synonym = 0.15),
    TaskSpec("Award", 104, RomanEvent, nL = 280, nExtra = 40, nR = 120,
      typo = 0.20, drop = 0.35, synonym = 0.20),
    TaskSpec("Tournament", 105, RomanEvent, nL = 250, nExtra = 30, nR = 100,
      typo = 0.25, drop = 0.30, synonym = 0.15),
    TaskSpec("ChristianBishop", 106, Person, nL = 700, nExtra = 100, nR = 180,
      typo = 0.50, drop = 0.10, abbrev = 0.20),
    TaskSpec("MemberOfParliament", 107, Person, nL = 900, nExtra = 100, nR = 220,
      typo = 0.45, drop = 0.10, abbrev = 0.15, alias = 0.05),
    TaskSpec("GivenName", 108, Person, nL = 400, nExtra = 60, nR = 120,
      typo = 0.60, drop = 0.05, abbrev = 0.10),
    TaskSpec("Wrestler", 109, Person, nL = 600, nExtra = 80, nR = 180,
      typo = 0.45, drop = 0.10, alias = 0.30),
    TaskSpec("Monarch", 110, Monarch, nL = 600, nExtra = 80, nR = 160,
      typo = 0.30, drop = 0.25),
    TaskSpec("Hospital", 111, Org, nL = 420, nExtra = 50, nR = 140,
      typo = 0.30, drop = 0.20, abbrev = 0.35, synonym = 0.25),
    TaskSpec("GovernmentAgency", 112, Org, nL = 380, nExtra = 50, nR = 130,
      typo = 0.25, drop = 0.30, abbrev = 0.20, synonym = 0.20),
    TaskSpec("Drug", 113, Code, nL = 700, nExtra = 100, nR = 150,
      typo = 0.50, drop = 0.05, alias = 0.35),
    TaskSpec("ArtificialSatellite", 114, Code, nL = 600, nExtra = 90, nR = 120,
      typo = 0.50, drop = 0.05, alias = 0.10),
    TaskSpec("Song", 115, TitleParen, nL = 800, nExtra = 100, nR = 200,
      typo = 0.30, drop = 0.35),
    TaskSpec("Artwork", 116, TitleParen, nL = 500, nExtra = 60, nR = 140,
      typo = 0.35, drop = 0.30),
    TaskSpec("Stadium", 117, Station, nL = 150, nExtra = 10, nR = 100,
      typo = 0.40, drop = 0.30, synonym = 0.20),
    TaskSpec("RailwayLine", 118, Station, nL = 140, nExtra = 15, nR = 90,
      typo = 0.35, drop = 0.30, synonym = 0.25),
    TaskSpec("TelevisionStation", 119, Org, nL = 450, nExtra = 60, nR = 150,
      typo = 0.35, drop = 0.25, abbrev = 0.25, alias = 0.08),
    TaskSpec("EthnicGroup", 120, Person, nL = 500, nExtra = 60, nR = 150,
      typo = 0.55, drop = 0.10),
  )

  /** A tiny task for unit tests (seconds, not minutes). */
  def tiny(seed: Long = 7, family: Family = TeamSeason): SingleTask =
    BenchmarkGen.generate(TaskSpec("tiny", seed, family, nL = 120, nExtra = 20, nR = 50,
      typo = 0.35, drop = 0.25, synonym = 0.25))
}
