package repro.core

import repro.SparkSpec
import repro.ldbc.LdbcData

/** Edge-rewrite resolution: FK-PK, FK-FK, and the dangling-FK guard. */
class RewritesSpec extends SparkSpec {

  private lazy val cat = LdbcData.catalog(spark, 0.02)

  private def q(refs: Seq[TableRef], joins: Seq[JoinPred]) =
    Query("t", refs, joins, out = Seq(OutCol(refs.head.alias,
      cat.raw(refs.head.table).columns.head)))

  test("FK-PK resolves regardless of which side the FK is written on") {
    val query = q(
      Seq(TableRef("k", "knows"), TableRef("p", "person")),
      Seq(JoinPred("k", "person1id", "p", "personid")))
    val r = Rewrites.resolve(cat, query, query.joins.head)
    assert(r.contains(Rewrites.FkPk("k", "rid_person1id", "p", "person1id")))

    val flipped = q(
      Seq(TableRef("k", "knows"), TableRef("p", "person")),
      Seq(JoinPred("p", "personid", "k", "person1id")))
    val r2 = Rewrites.resolve(cat, flipped, flipped.joins.head)
    assert(r2.contains(Rewrites.FkPk("k", "rid_person1id", "p", "person1id")))
  }

  test("FK-FK resolves for two FKs into the same PK (knows.person2id = knows.person1id)") {
    val query = q(
      Seq(TableRef("k1", "knows"), TableRef("k2", "knows")),
      Seq(JoinPred("k1", "person2id", "k2", "person1id")))
    val r = Rewrites.resolve(cat, query, query.joins.head)
    assert(r.contains(Rewrites.FkFk("k1", "rid_person2id", "person2id",
      "k2", "rid_person1id", "person1id")))
  }

  test("FK-FK is refused when either FK can dangle (comment.replyof_post)") {
    // comment.replyof_post and post_tag.messageid both point at post.id, but
    // replyof_post dangles (0 ⇒ RID -1): two distinct missing values would
    // both map to -1 and spuriously join, so the rewrite must not fire.
    assert(!cat.danglingFree("comment", "replyof_post"))
    assert(cat.danglingFree("post_tag", "messageid"))
    val query = q(
      Seq(TableRef("c", "comment"), TableRef("mt", "post_tag")),
      Seq(JoinPred("c", "replyof_post", "mt", "messageid")))
    assert(Rewrites.resolve(cat, query, query.joins.head).isEmpty)
  }

  test("FKs into different PK targets never FK-FK-rewrite") {
    val query = q(
      Seq(TableRef("k", "knows"), TableRef("mt", "post_tag")),
      Seq(JoinPred("k", "person1id", "mt", "messageid")))
    assert(Rewrites.resolve(cat, query, query.joins.head).isEmpty)
  }

  test("non-FK columns resolve to nothing") {
    val query = q(
      Seq(TableRef("p1", "person"), TableRef("p2", "person")),
      Seq(JoinPred("p1", "firstname", "p2", "firstname")))
    assert(Rewrites.resolve(cat, query, query.joins.head).isEmpty)
  }
}
