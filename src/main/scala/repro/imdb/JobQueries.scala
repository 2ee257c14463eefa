package repro.imdb

import repro.core._
import repro.core.Pred._

/** JOB-lite: the 33 first variants of the Join Order Benchmark (Table 4/8)
  * plus the b-variants of Q1–Q6 used by the Table 7 plan-spectrum study.
  *
  * Queries are structural reproductions over the synthetic IMDB-lite schema:
  * the join graph (which entity/relationship tables participate) follows the
  * original benchmark; LIKE predicates become equality/range predicates of a
  * comparable selectivity class (EXPERIMENTS.md documents this). Every query
  * aggregates MIN(...) like the original. `refs` order is the pinned join
  * order, selective tables first — the stand-in for the paper's injected
  * true-cardinality orders (Appendix B).
  */
object JobQueries {

  /** alias -> table */
  private val tableOf = Map(
    "t" -> "title", "t2" -> "title", "kt" -> "kind_type", "cn" -> "company_name",
    "ct" -> "company_type", "mc" -> "movie_companies", "k" -> "keyword",
    "mk" -> "movie_keyword", "it" -> "info_type", "it2" -> "info_type",
    "mi" -> "movie_info", "mix" -> "movie_info_idx", "ci" -> "cast_info",
    "n" -> "name", "rt" -> "role_type", "an" -> "aka_name", "ml" -> "movie_link",
    "lt" -> "link_type", "cc" -> "complete_cast", "cct1" -> "comp_cast_type",
    "cct2" -> "comp_cast_type")

  /** Canonical FK edges of the JOB-lite join graph, applied when both
    * aliases appear in a query.
    */
  private val ruleEdges: Seq[(String, String, String, String)] = Seq(
    ("mc", "movie_id", "t", "id"), ("mc", "company_id", "cn", "id"),
    ("mc", "company_type_id", "ct", "id"),
    ("mk", "movie_id", "t", "id"), ("mk", "keyword_id", "k", "id"),
    ("mi", "movie_id", "t", "id"), ("mi", "info_type_id", "it", "id"),
    ("mix", "movie_id", "t", "id"), ("mix", "info_type_id", "it2", "id"),
    ("ci", "movie_id", "t", "id"), ("ci", "person_id", "n", "id"),
    ("ci", "role_id", "rt", "id"),
    ("t", "kind_id", "kt", "id"),
    ("an", "person_id", "n", "id"),
    ("ml", "movie_id", "t", "id"), ("ml", "linked_movie_id", "t2", "id"),
    ("ml", "link_type_id", "lt", "id"),
    ("cc", "movie_id", "t", "id"), ("cc", "subject_id", "cct1", "id"),
    ("cc", "status_id", "cct2", "id"))

  private def jq(name: String, aliases: Seq[(String, Option[Pred])],
                 mins: Seq[(String, String)]): Query = {
    val present = aliases.map(_._1).toSet
    val joins = ruleEdges.collect {
      case (a, ac, b, bc) if present(a) && present(b) => JoinPred(a, ac, b, bc)
    }
    Query(name,
      refs = aliases.map { case (a, p) => TableRef(a, tableOf(a), p) },
      joins = joins,
      out = Seq.empty,
      agg = Some(AggSpec(Seq.empty, mins.zipWithIndex.map { case ((a, c), i) =>
        AggExpr("min", Some(OutCol(a, c)), s"m$i")
      })))
  }

  private def a(alias: String): (String, Option[Pred]) = (alias, None)
  private def a(alias: String, p: Pred): (String, Option[Pred]) = (alias, Some(p))

  // Frequently reused predicate shorthands.
  private val prodCo  = eqS("kind", "production companies")
  private val usCo    = eqS("country_code", "[us]")
  private val deCo    = eqS("country_code", "[de]")
  private val movieKt = eqS("kind", "movie")

  val queries: Seq[Query] = Seq(
    jq("1a", Seq(a("it2", eqS("info", "top 250 rank")), a("mix"), a("t"),
      a("mc", inS("note", "(co-production)", "(presents)")), a("ct", prodCo)),
      Seq("mc" -> "note", "t" -> "title", "t" -> "production_year")),
    jq("1b", Seq(a("it2", eqS("info", "bottom 10 rank")), a("mix"), a("t",
      between("production_year", 2005, 2010)), a("mc"), a("ct", prodCo)),
      Seq("mc" -> "note", "t" -> "title", "t" -> "production_year")),

    jq("2a", Seq(a("k", eqS("keyword", "character-name-in-title")), a("mk"),
      a("t"), a("mc"), a("cn", deCo)),
      Seq("t" -> "title")),
    jq("2b", Seq(a("k", eqS("keyword", "character-name-in-title")), a("mk"),
      a("t"), a("mc"), a("cn", eqS("country_code", "[nl]"))),
      Seq("t" -> "title")),

    jq("3a", Seq(a("k", eqS("keyword", "sequel")), a("mk"),
      a("t", gt("production_year", 2005)),
      a("mi", inS("info", "Sweden", "Norway", "Germany", "Denmark", "USA"))),
      Seq("t" -> "title")),
    jq("3b", Seq(a("k", eqS("keyword", "10,000-mile-club")), a("mk"),
      a("t", gt("production_year", 2010)), a("mi", inS("info", "Sweden", "Germany"))),
      Seq("t" -> "title")),

    jq("4a", Seq(a("k", eqS("keyword", "sequel")), a("mk"),
      a("t", gt("production_year", 2005)),
      a("mix", Cmp("info", OpGt, LS("5.0"))), a("it2", eqS("info", "rating"))),
      Seq("mix" -> "info", "t" -> "title")),
    jq("4b", Seq(a("k", eqS("keyword", "sequel")), a("mk"),
      a("t", gt("production_year", 2010)),
      a("mix", Cmp("info", OpGt, LS("9.0"))), a("it2", eqS("info", "rating"))),
      Seq("mix" -> "info", "t" -> "title")),

    // Q5a: predicates only on relationship tables — sip has nothing
    // selective to pass (paper: 0.8x, scan reduction 1x).
    jq("5a", Seq(a("ct", prodCo), a("mc", inS("note", "(presents)", "(TV)")),
      a("t", gt("production_year", 1970)),
      a("mi", inS("info", "Sweden", "Norway", "Germany", "Denmark", "USA",
        "Drama", "Comedy", "Horror", "Action", "Thriller"))),
      Seq("t" -> "title")),
    jq("5b", Seq(a("ct", prodCo), a("mc", inS("note", "(TV)")),
      a("t", gt("production_year", 2005)), a("mi", inS("info", "USA", "Drama"))),
      Seq("t" -> "title")),

    jq("6a", Seq(a("k", eqS("keyword", "marvel-cinematic-universe")), a("mk"),
      a("t", gt("production_year", 2005)), a("ci"),
      a("n", eqS("name", "Downey Robert Jr."))),
      Seq("k" -> "keyword", "n" -> "name", "t" -> "title")),
    jq("6b", Seq(a("k", eqS("keyword", "superhero")), a("mk"),
      a("t", gt("production_year", 2000)), a("ci"),
      a("n", and(geS("name", "D"), ltS("name", "E")))),
      Seq("k" -> "keyword", "n" -> "name", "t" -> "title")),

    jq("7a", Seq(a("n", and(geS("name", "A"), ltS("name", "C"), eqS("gender", "m"))),
      a("an"), a("ci"), a("t", between("production_year", 1980, 1995)),
      a("ml"), a("lt", eqS("link", "features")), a("t2")),
      Seq("n" -> "name", "t" -> "title")),

    jq("8a", Seq(a("ci", eqS("note", "(voice: English version)")), a("n"),
      a("rt", eqS("role", "actress")), a("t"), a("mc"),
      a("cn", eqS("country_code", "[jp]")), a("an")),
      Seq("an" -> "name", "t" -> "title")),

    jq("9a", Seq(a("n", and(eqS("gender", "f"), geS("name", "Z"))), a("ci",
      inS("note", "(voice)", "(voice: English version)")), a("rt", eqS("role", "actress")),
      a("t"), a("mc"), a("cn", usCo), a("an")),
      Seq("an" -> "name", "n" -> "name", "t" -> "title")),

    jq("10a", Seq(a("rt", eqS("role", "actor")), a("ci", eqS("note", "(producer)")),
      a("t"), a("mc"), a("cn", eqS("country_code", "[ru]")), a("ct")),
      Seq("t" -> "title")),

    jq("11a", Seq(a("k", eqS("keyword", "sequel")), a("mk"), a("t",
      between("production_year", 1990, 2010)), a("ml"),
      a("lt", inS("link", "follows", "followed by")), a("t2"), a("mc"),
      a("cn", neS("country_code", "[pl]")), a("ct", prodCo)),
      Seq("cn" -> "name", "lt" -> "link", "t" -> "title")),

    jq("12a", Seq(a("it2", eqS("info", "rating")), a("mix", Cmp("info", OpGt, LS("8.0"))),
      a("t", between("production_year", 2000, 2010)), a("mi",
        inS("info", "Drama", "Horror")), a("it", eqS("info", "genres")),
      a("mc"), a("cn", usCo), a("ct", prodCo)),
      Seq("cn" -> "name", "mix" -> "info", "t" -> "title")),

    jq("13a", Seq(a("kt", movieKt), a("t"), a("mix", Cmp("info", OpLt, LS("3.0"))),
      a("it2", eqS("info", "rating")), a("mi", inS("info", "Germany", "Sweden")),
      a("it", eqS("info", "countries")), a("mc"), a("cn", deCo), a("ct", prodCo)),
      Seq("mix" -> "info", "t" -> "title")),

    jq("14a", Seq(a("k", inS("keyword", "sequel", "superhero")), a("mk"),
      a("t", gt("production_year", 2005)), a("kt", movieKt),
      a("mix", Cmp("info", OpLt, LS("8.5"))), a("it2", eqS("info", "rating")),
      a("mi", inS("info", "Sweden", "Norway", "Germany", "Denmark", "USA")),
      a("it", eqS("info", "countries"))),
      Seq("mix" -> "info", "t" -> "title")),

    jq("15a", Seq(a("cn", usCo), a("mc", eqS("note", "(2006) (USA)")),
      a("t", gt("production_year", 2000)), a("mk"), a("k"),
      a("mi", inS("info", "Drama", "Comedy")), a("it", eqS("info", "release dates"))),
      Seq("mi" -> "info", "t" -> "title")),

    jq("16a", Seq(a("k", eqS("keyword", "character-name-in-title")), a("mk"),
      a("t"), a("mc"), a("cn", usCo), a("ci"), a("n"), a("an")),
      Seq("an" -> "name", "t" -> "title")),

    jq("17a", Seq(a("k", eqS("keyword", "character-name-in-title")), a("mk"),
      a("t"), a("ci"), a("n", and(geS("name", "B"), ltS("name", "C"))), a("mc"),
      a("cn")),
      Seq("n" -> "name")),

    jq("18a", Seq(a("it2", eqS("info", "votes")), a("mix"), a("t"),
      a("mi", inS("info", "Drama", "Action")), a("it", eqS("info", "genres")),
      a("ci", inS("note", "(producer)", "(writer)")),
      a("n", and(eqS("gender", "m"), geS("name", "T")))),
      Seq("mix" -> "info", "t" -> "title")),

    jq("19a", Seq(a("n", and(eqS("gender", "f"), geS("name", "A"), ltS("name", "B"))),
      a("an"), a("ci", eqS("note", "(voice)")), a("rt", eqS("role", "actress")),
      a("t", between("production_year", 2000, 2010)), a("mi",
        inS("info", "Japan", "USA")), a("it", eqS("info", "release dates")),
      a("mc"), a("cn", usCo)),
      Seq("n" -> "name", "t" -> "title")),

    // Q20a: star pattern over complete_cast with weak predicates (paper 1.0x).
    jq("20a", Seq(a("cct1", eqS("kind", "cast")), a("cc"), a("cct2",
      eqS("kind", "complete")), a("t", gt("production_year", 1950)),
      a("kt", movieKt), a("mk"), a("k", inS("keyword", "superhero", "sequel")),
      a("ci"), a("n")),
      Seq("t" -> "title")),

    jq("21a", Seq(a("k", eqS("keyword", "10,000-mile-club")), a("mk"), a("t"),
      a("ml"), a("lt", inS("link", "follows", "followed by")), a("t2"),
      a("mc"), a("cn", neS("country_code", "[pl]")), a("ct", prodCo),
      a("mi", inS("info", "Sweden", "Germany"))),
      Seq("cn" -> "name", "lt" -> "link", "t" -> "title")),

    jq("22a", Seq(a("k", inS("keyword", "marvel-cinematic-universe", "superhero")),
      a("mk"), a("t", gt("production_year", 2008)), a("kt", movieKt),
      a("mix", Cmp("info", OpLt, LS("7.0"))), a("it2", eqS("info", "rating")),
      a("mi", inS("info", "Germany", "Sweden", "USA")), a("it", eqS("info", "countries")),
      a("mc"), a("cn", neS("country_code", "[us]")), a("ct")),
      Seq("cn" -> "name", "mix" -> "info", "t" -> "title")),

    jq("23a", Seq(a("cct1", eqS("kind", "complete")), a("cc"), a("t",
      gt("production_year", 2000)), a("kt", movieKt), a("mi",
        inS("info", "USA", "Japan")), a("it", eqS("info", "release dates")),
      a("mc"), a("cn", usCo), a("ct")),
      Seq("kt" -> "kind", "t" -> "title")),

    jq("24a", Seq(a("k", inS("keyword", "sequel", "superhero")), a("mk"),
      a("t", gt("production_year", 2005)), a("ci", eqS("note", "(voice)")),
      a("n", and(eqS("gender", "f"), geS("name", "A"), ltS("name", "C"))),
      a("rt", eqS("role", "actress")), a("an"), a("mi", inS("info", "Japan", "USA")),
      a("it", eqS("info", "release dates")), a("mc"), a("cn", usCo)),
      Seq("n" -> "name", "t" -> "title")),

    jq("25a", Seq(a("k", inS("keyword", "superhero", "marvel-cinematic-universe")),
      a("mk"), a("t"), a("mix"), a("it2", eqS("info", "votes")),
      a("mi", inS("info", "Horror")), a("it", eqS("info", "genres")),
      a("ci"), a("n", eqS("gender", "m"))),
      Seq("mi" -> "info", "mix" -> "info", "n" -> "name", "t" -> "title")),

    jq("26a", Seq(a("cct1", eqS("kind", "cast")), a("cc"), a("t",
      gt("production_year", 2000)), a("kt", movieKt),
      a("mk"), a("k", eqS("keyword", "superhero")),
      a("mix", Cmp("info", OpGt, LS("7.0"))), a("it2", eqS("info", "rating")),
      a("ci"), a("n", geS("name", "S"))),
      Seq("n" -> "name", "t" -> "title")),

    jq("27a", Seq(a("k", eqS("keyword", "10,000-mile-club")), a("mk"),
      a("t", gt("production_year", 1990)), a("cc"), a("cct1", eqS("kind", "cast")),
      a("cct2", eqS("kind", "complete")), a("ml"),
      a("lt", inS("link", "features", "featured in")), a("t2"), a("mc"),
      a("cn", neS("country_code", "[pl]")), a("ct", prodCo)),
      Seq("cn" -> "name", "lt" -> "link", "t" -> "title")),

    jq("28a", Seq(a("k", eqS("keyword", "marvel-cinematic-universe")), a("mk"),
      a("t", gt("production_year", 2005)), a("cc"), a("cct1", eqS("kind", "crew")),
      a("cct2", neS("kind", "complete+verified")), a("kt", movieKt),
      a("mix", Cmp("info", OpLt, LS("8.5"))), a("it2", eqS("info", "rating")),
      a("mi", inS("info", "Sweden", "Germany", "USA")), a("it", eqS("info", "countries")),
      a("mc"), a("cn", neS("country_code", "[us]")), a("ct")),
      Seq("cn" -> "name", "mix" -> "info", "t" -> "title")),

    jq("29a", Seq(a("k", eqS("keyword", "superhero")), a("mk"), a("t",
      between("production_year", 2005, 2015)), a("cc"),
      a("cct1", eqS("kind", "cast")), a("ci", eqS("note", "(voice)")), a("n", and(eqS("gender", "f"),
        geS("name", "A"), ltS("name", "D"))), a("rt", eqS("role", "actress")),
      a("an"), a("mi", inS("info", "Japan", "USA")), a("it", eqS("info", "release dates")),
      a("mc"), a("cn", usCo)),
      Seq("n" -> "name", "t" -> "title")),

    jq("30a", Seq(a("cct1", eqS("kind", "cast")), a("cc"), a("cct2",
      eqS("kind", "complete")), a("t", gt("production_year", 2000)),
      a("mk"), a("k", inS("keyword", "superhero", "marvel-cinematic-universe")),
      a("mi", inS("info", "Horror", "Thriller")), a("it", eqS("info", "genres")),
      a("mix", Cmp("info", OpGt, LS("6.0"))), a("it2", eqS("info", "votes")),
      a("ci"), a("n", eqS("gender", "m"))),
      Seq("mi" -> "info", "mix" -> "info", "n" -> "name", "t" -> "title")),

    jq("31a", Seq(a("k", inS("keyword", "superhero", "sequel")), a("mk"),
      a("t"), a("mi", inS("info", "Horror", "Thriller")), a("it", eqS("info", "genres")),
      a("mix", Cmp("info", OpGt, LS("7.0"))), a("it2", eqS("info", "votes")),
      a("ci"), a("n", geS("name", "Z")), a("mc"), a("cn", geS("name", "Company 1"))),
      Seq("mi" -> "info", "mix" -> "info", "n" -> "name", "t" -> "title")),

    jq("32a", Seq(a("k", eqS("keyword", "10,000-mile-club")), a("mk"), a("t"),
      a("ml"), a("lt"), a("t2")),
      Seq("lt" -> "link", "t" -> "title", "t2" -> "title")),

    jq("33a", Seq(a("cn", usCo), a("mc"), a("t", between("production_year", 2000, 2010)),
      a("kt", movieKt), a("mix", Cmp("info", OpLt, LS("3.5"))),
      a("it2", eqS("info", "rating")), a("ml"),
      a("lt", inS("link", "follows", "followed by")), a("t2")),
      Seq("cn" -> "name", "mix" -> "info", "t" -> "title", "t2" -> "title")),
  )

  def byName(name: String): Query = queries.find(_.name == name).get

  /** The 12 queries of the Table 7 / plan-spectrum study. */
  val spectrumNames: Seq[String] =
    Seq("1a", "1b", "2a", "2b", "3a", "3b", "4a", "4b", "5a", "5b", "6a", "6b")
}
