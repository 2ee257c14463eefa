package repro

import org.apache.spark.sql.functions._

/** TPC-H-lite generators: sizes, FK ranges, fixed reference tables. */
class SynthDataSpec extends SparkSpec {
  private val Sf = 0.002

  test("lineitem carries valid order/part/supplier FKs") {
    val li = SynthData.lineitem(spark, Sf)
    val nOrders = SynthData.orders(spark, Sf).count()
    val nPart = SynthData.part(spark, Sf).count()
    val nSupp = SynthData.supplier(spark, Sf).count()
    val mm = li.agg(min("l_orderkey"), max("l_orderkey"), min("l_partkey"),
      max("l_partkey"), min("l_suppkey"), max("l_suppkey")).head
    assert(mm.getLong(0) >= 1 && mm.getLong(1) <= nOrders)
    assert(mm.getLong(2) >= 1 && mm.getLong(3) <= nPart)
    assert(mm.getLong(4) >= 1 && mm.getLong(5) <= nSupp)
  }

  test("nation and region are the 25/5 fixed TPC-H tables") {
    val n = SynthData.nation(spark)
    val r = SynthData.region(spark)
    assert(n.count() == 25 && r.count() == 5)
    assert(n.filter(col("n_name") === "GERMANY").head.getInt(2) == 3) // EUROPE
    assert(r.filter(col("r_name") === "EUROPE").head.getInt(0) == 3)
    // every n_regionkey is a valid region
    assert(n.join(r, n("n_regionkey") === r("r_regionkey")).count() == 25)
  }

  test("orders has the five standard priorities") {
    val o = SynthData.orders(spark, Sf)
    val ps = o.select("o_orderpriority").distinct().collect().map(_.getString(0)).toSet
    assert(ps.subsetOf(Set("1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT SPECIFIED", "5-LOW")))
  }

  test("partsupp references valid parts and suppliers") {
    val ps = SynthData.partsupp(spark, Sf)
    val nPart = SynthData.part(spark, Sf).count()
    val nSupp = SynthData.supplier(spark, Sf).count()
    val mm = ps.agg(min("ps_partkey"), max("ps_partkey"),
      min("ps_suppkey"), max("ps_suppkey")).head
    assert(mm.getLong(0) >= 1 && mm.getLong(1) <= nPart)
    assert(mm.getLong(2) >= 1 && mm.getLong(3) <= nSupp)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.supplier(spark, Sf).collect().map(_.toSeq).toSeq
    val b = SynthData.supplier(spark, Sf).collect().map(_.toSeq).toSeq
    assert(a == b)
  }
}
