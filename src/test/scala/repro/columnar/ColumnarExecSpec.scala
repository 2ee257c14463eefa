package repro.columnar

import repro.SparkSpec
import repro.core._
import repro.ldbc.{LdbcData, SnbQueries}

/** Serial engine behaviour: physical zone skipping, point lookups, metrics.
  * (Result correctness against the oracle is covered by SnbEquivalenceSpec.)
  */
class ColumnarExecSpec extends SparkSpec {

  private lazy val cat   = LdbcData.catalog(spark, 0.02)
  private lazy val store = LdbcData.store(cat)
  private lazy val sc    = LdbcData.scale(0.02)
  private def q(name: String): Query = SnbQueries.queries(sc).find(_.name == name).get

  test("duck config scans full tables and skips no zones") {
    val (_, m) = new ColumnarExec(store, cat, GrainConfig.Duck).run(q("IC2"))
    assert(m.scanned("c") == cat.rows("comment"))
    assert(m.zonesSkipped == 0)
  }

  test("grain config physically skips zones on sip-filtered scans") {
    Bitmap.withZoneSize(8) {
      val (_, m) = new ColumnarExec(store, cat, GrainConfig.Full).run(q("IC2"))
      assert(m.scanned("c") < cat.rows("comment"))
      assert(m.zonesSkipped > 0)
    }
  }

  test("point lookups use the PK index instead of scanning (IS4)") {
    val (_, m) = new ColumnarExec(store, cat, GrainConfig.Duck).run(q("IS4"))
    assert(m.scanned("c") == 1L)
    assert(m.indexLookups == 1)
  }

  test("join merging records zero scan for the dropped relationship leaf") {
    val (_, m) = new ColumnarExec(store, cat, GrainConfig.Full).run(q("IC1-1"))
    assert(m.scanned("k") == 0L)
  }

  test("probe counts drop when sip prunes the probe side") {
    val (_, md) = new ColumnarExec(store, cat, GrainConfig.Duck).run(q("IC2"))
    val (_, mg) = new ColumnarExec(store, cat, GrainConfig.Full).run(q("IC2"))
    assert(mg.probes < md.probes)
  }

  test("ablation: total scan monotonically decreases across configs") {
    val configs = Seq(GrainConfig.Duck, GrainConfig.RidOnly, GrainConfig.NoJm, GrainConfig.Full)
    val scans = configs.map(c =>
      new ColumnarExec(store, cat, c).run(q("IC2"))._2.totalScanned)
    assert(scans.sliding(2).forall(p => p(1) <= p(0)), scans.toString)
  }

  test("Inter exposes schema-addressed columns") {
    val (inter, _) = new ColumnarExec(store, cat, GrainConfig.Duck).run(q("IS5"))
    assert(inter.schema.toSet == Set("p_personid", "p_firstname", "p_lastname"))
    assert(inter.idx("p_personid") >= 0)
    intercept[RuntimeException](inter.idx("nope"))
  }
}
