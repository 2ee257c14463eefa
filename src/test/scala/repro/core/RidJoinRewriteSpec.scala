package repro.core

import org.apache.spark.sql.catalyst.expressions.{AttributeReference, EqualTo}
import org.apache.spark.sql.catalyst.plans.logical.Join
import repro.{Oracle, SparkSpec}

/** The Catalyst rule: FK=PK join conditions become RID equalities in the
  * optimized plan, with unchanged results.
  */
class RidJoinRewriteSpec extends SparkSpec {
  import spark.implicits._

  private lazy val cat: GrainCatalog = {
    val c = new GrainCatalog(spark)
    c.register("person_r", Seq((101L, "Mahinda"), (202L, "Karim"), (303L, "Carmen"),
      (404L, "Zhang")).toDF("pid", "name"), Seq("pid"))
    c.register("follows_r", Seq((1L, 101L, 202L, 2021L), (2L, 303L, 404L, 2019L),
      (3L, 101L, 303L, 2021L), (4L, 202L, 303L, 2020L), (5L, 101L, 404L, 2021L))
      .toDF("fid", "id1", "id2", "year"), Seq("fid"))
    c.predefine(PredefJoin("follows_r", "id1", "person_r", "pid"))
    c.predefine(PredefJoin("follows_r", "id2", "person_r", "pid"))
    c.freeze()
    c
  }

  private lazy val views: Unit = {
    cat.ext("person_r").createOrReplaceTempView("person_v")
    cat.ext("follows_r").createOrReplaceTempView("follows_v")
  }

  private def withRule[A](body: => A): A = {
    views
    RidJoinRewrite.install(spark, cat)
    try body finally RidJoinRewrite.uninstall(spark)
  }

  private def ridJoinConds(df: org.apache.spark.sql.DataFrame): Seq[(String, String)] =
    df.queryExecution.optimizedPlan.collect {
      case Join(_, _, _, Some(cond), _) =>
        cond.collect {
          case EqualTo(a: AttributeReference, b: AttributeReference) => (a.name, b.name)
        }
    }.flatten

  test("rewrites fk=pk to rid_fk=__rid in the optimized plan") {
    withRule {
      val df = spark.sql(
        "SELECT p.name, f.year FROM person_v p, follows_v f WHERE p.pid = f.id1")
      val conds = ridJoinConds(df)
      assert(conds.exists { case (a, b) =>
        Set(a, b) == Set("rid_id1", "__rid")
      }, s"no RID join in $conds")
      // results unchanged vs the raw value join
      Oracle.assertEquivalent(
        df.select(df("name").as("name"), df("year").as("year")),
        "SELECT p.name AS name, CAST(f.year AS BIGINT) AS year " +
          "FROM person_r p, follows_r f WHERE p.pid = f.id1",
        "person_r" -> cat.raw("person_r"), "follows_r" -> cat.raw("follows_r"))
    }
  }

  test("rewrites survive column pruning (rid columns re-threaded)") {
    withRule {
      // projects neither rid column; pruning would have removed them
      val df = spark.sql(
        "SELECT count(*) AS c FROM person_v p, follows_v f WHERE p.pid = f.id2")
      assert(ridJoinConds(df).exists { case (a, b) => Set(a, b) == Set("rid_id2", "__rid") })
      assert(df.collect().head.getLong(0) == 5L)
    }
  }

  test("self-joins through two follows references rewrite both conditions") {
    withRule {
      val df = spark.sql(
        """SELECT count(*) AS c
          |FROM person_v p1, follows_v f1, person_v p2
          |WHERE p1.pid = f1.id1 AND f1.id2 = p2.pid""".stripMargin)
      val conds = ridJoinConds(df)
      assert(conds.count { case (x, y) => Set(x, y) == Set("rid_id1", "__rid") ||
        Set(x, y) == Set("rid_id2", "__rid") } == 2, s"got $conds")
      assert(df.collect().head.getLong(0) == 5L)
    }
  }

  test("non-predefined joins are left untouched") {
    withRule {
      val df = spark.sql(
        "SELECT count(*) AS c FROM follows_v f1, follows_v f2 WHERE f1.id1 = f2.id1")
      val conds = ridJoinConds(df)
      assert(conds.forall { case (x, y) => !Set(x, y).contains("__rid") })
    }
  }

  test("uninstall removes the rule") {
    views
    RidJoinRewrite.install(spark, cat)
    RidJoinRewrite.uninstall(spark)
    val df = spark.sql(
      "SELECT p.name FROM person_v p, follows_v f WHERE p.pid = f.id1")
    assert(ridJoinConds(df).forall { case (x, y) => !Set(x, y).contains("__rid") })
  }
}
