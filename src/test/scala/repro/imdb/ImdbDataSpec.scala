package repro.imdb

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** IMDB-lite generator: FK integrity, notable constants, skew. */
class ImdbDataSpec extends SparkSpec {
  private val Sf = 0.01
  private lazy val ts = ImdbData.tables(spark, Sf)
  private lazy val sc = ImdbData.scale(Sf)

  test("table sizes match the scale") {
    assert(ts("title").count() == sc.nTitle)
    assert(ts("cast_info").count() == sc.nCi)
    assert(ts("movie_keyword").count() == sc.nMk)
    assert(ts("info_type").count() == 113)
    assert(ts("kind_type").count() == 7)
    assert(ts("comp_cast_type").count() == 4)
  }

  test("relationship FKs reference valid entities") {
    def danglers(f: String, fk: String, p: String, pk: String): Long =
      ts(f).join(ts(p).select(col(pk).as("__p")), col(fk) === col("__p"), "left_anti").count()
    assert(danglers("movie_companies", "movie_id", "title", "id") == 0)
    assert(danglers("movie_companies", "company_id", "company_name", "id") == 0)
    assert(danglers("movie_keyword", "keyword_id", "keyword", "id") == 0)
    assert(danglers("cast_info", "person_id", "name", "id") == 0)
    assert(danglers("movie_link", "linked_movie_id", "title", "id") == 0)
  }

  test("notable keywords sit at their designated ids") {
    val kw = ts("keyword").collect().map(r => r.getLong(0) -> r.getString(1)).toMap
    assert(kw(1L) == "character-name-in-title")
    assert(kw(2L) == "sequel")
    assert(kw(sc.nKeyword.toLong) == "10,000-mile-club")
    assert(kw(sc.nKeyword - 2L) == "marvel-cinematic-universe")
    assert(kw.contains(7L))
  }

  test("keyword skew: frequent keywords reference far more movies than rare ones") {
    val counts = ts("movie_keyword").groupBy("keyword_id").count()
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    val frequent = counts.getOrElse(1L, 0L)
    val rare = counts.getOrElse(sc.nKeyword.toLong, 0L)
    assert(frequent > 10 * math.max(1, rare),
      s"expected strong skew, got frequent=$frequent rare=$rare")
  }

  test("Downey exists and ratings parse as d.d strings") {
    assert(ts("name").filter(col("name") === "Downey Robert Jr.").count() == 1)
    val infos = ts("movie_info_idx").select("info").limit(50).collect().map(_.getString(0))
    assert(infos.forall(_.matches("\\d\\.\\d")))
  }

  test("catalog exposes extended indices for the m2m tables") {
    val cat = ImdbData.catalog(spark, Sf)
    assert(cat.ridIndex("movie_keyword", "keyword_id").exists(_.extended))
    assert(cat.ridIndex("movie_keyword", "movie_id").exists(_.extended))
    assert(cat.ridIndex("cast_info", "movie_id").exists(_.extended))
    assert(cat.ridIndex("title", "kind_id").exists(!_.extended))
  }
}
