package repro.core

import repro.SparkSpec

/** RID materialization (§3): dense `__rid` assignment and `rid_<fk>`. */
class RidMaterializerSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  test("withRid assigns dense 0..n-1 in pk order") {
    import spark.implicits._
    val df = Seq(30L, 10L, 20L).toDF("id")
    val rid = RidMaterializer.withRid(df, Seq("id")).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toMap
    assert(rid == Map(10L -> 0L, 20L -> 1L, 30L -> 2L))
  }

  test("materialize points each F row at the matching P RID") {
    import spark.implicits._
    val p = RidMaterializer.withRid(Seq(101L, 202L, 303L, 404L).toDF("id"), Seq("id"))
    val f = Seq((101L, 2021L), (303L, 2019L), (101L, 2021L)).toDF("fk", "year")
    val ext = RidMaterializer.materialize(f, "fk", p, "id")
    assert(ext.columns.contains("rid_fk"))
    val rows = ext.select("fk", "rid_fk").collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(rows.toSet == Set((101L, 0L), (303L, 2L)))
    assert(rows.count(_._1 == 101L) == 2) // multiplicity preserved
  }

  test("dangling FKs materialize as -1 (match nothing, like the value join)") {
    import spark.implicits._
    val p = RidMaterializer.withRid(Seq(1L).toDF("id"), Seq("id"))
    val f = Seq(1L, 999L).toDF("fk")
    val ext = RidMaterializer.materialize(f, "fk", p, "id")
    val byFk = ext.collect().map(r => (r.getLong(0), r.getLong(1))).toMap
    assert(byFk(1L) == 0L && byFk(999L) == -1L)
  }

  test("catalog running example: Follows' extended table matches Table 2") {
    import spark.implicits._
    val cat = new GrainCatalog(spark)
    cat.register("person", Seq((101L, "Mahinda"), (202L, "Karim"), (303L, "Carmen"),
      (404L, "Zhang")).toDF("id", "name"), Seq("id"))
    cat.register("follows", Seq((1L, 101L, 202L, 2021L), (2L, 303L, 404L, 2019L),
      (3L, 101L, 303L, 2021L), (4L, 202L, 303L, 2020L), (5L, 101L, 404L, 2021L))
      .toDF("fid", "id1", "id2", "year"), Seq("fid"))
    cat.predefine(PredefJoin("follows", "id1", "person", "id"))
    cat.predefine(PredefJoin("follows", "id2", "person", "id"))
    cat.freeze()
    val ext = cat.ext("follows").orderBy("__rid")
      .select("id1", "rid_id1", "id2", "rid_id2").collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSeq
    // Table 2(b): R1 = [0,2,0,1,0], R2 = [1,3,2,2,3]
    assert(ext == Seq((101L, 0L, 202L, 1L), (303L, 2L, 404L, 3L),
      (101L, 0L, 303L, 2L), (202L, 1L, 303L, 2L), (101L, 0L, 404L, 3L)))

    // and the RID index over it matches Fig. 2
    val idx = cat.buildRidIndex("follows", "id1", extendedWith = Some("id2"))
    assert(idx.neighbors(0).sorted.toSeq == Seq(0, 2, 4))
    assert(idx.neighbors(1).toSeq == Seq(3))
    assert(idx.neighbors(2).toSeq == Seq(1))
    assert(idx.neighbors(3).isEmpty)
    assert(idx.extended)
  }

  test("catalog pk() exposes single-column primary keys only") {
    import spark.implicits._
    val cat = new GrainCatalog(spark)
    cat.register("a", Seq(1L).toDF("x"), Seq("x"))
    cat.register("b", Seq((1L, 2L)).toDF("x", "y"), Seq("x", "y"))
    assert(cat.pk("a").contains("x"))
    assert(cat.pk("b").isEmpty)
  }

  test("findPredef matches exact (table, col) pairs only") {
    import spark.implicits._
    val cat = new GrainCatalog(spark)
    cat.register("p", Seq(1L).toDF("id"), Seq("id"))
    cat.register("f", Seq((1L, 1L)).toDF("fid", "fk"), Seq("fid"))
    cat.predefine(PredefJoin("f", "fk", "p", "id"))
    assert(cat.findPredef("f", "fk", "p", "id").isDefined)
    assert(cat.findPredef("p", "id", "f", "fk").isEmpty) // direction matters
    assert(cat.findPredef("f", "fid", "p", "id").isEmpty)
  }
}
