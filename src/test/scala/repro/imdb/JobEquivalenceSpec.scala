package repro.imdb

import repro.{Canon, Oracle, SparkSpec}
import repro.core._
import repro.columnar.ColumnarExec

/** Every JOB-lite query: vanilla Spark vs DuckDB oracle, GRainDB-mode vs
  * vanilla on both the Spark engine and the serial columnar substrate.
  */
class JobEquivalenceSpec extends SparkSpec {
  private val Sf = 0.01

  private lazy val cat = ImdbData.catalog(spark, Sf)
  private lazy val store = ImdbData.store(cat)
  private lazy val duck  = new SparkExec(cat, GrainConfig.Duck)
  private lazy val grain = new SparkExec(cat, GrainConfig.Full)

  for (q <- JobQueries.queries) {
    test(s"JOB ${q.name}: spark-duck matches DuckDB oracle") {
      val (df, _) = duck.run(q)
      val tables = q.refs.map(_.table).distinct.map(t => t -> cat.raw(t))
      Oracle.assertEquivalent(df, QueryIR.toSql(q, cat.rawMap), tables: _*)
    }

    test(s"JOB ${q.name}: spark-grain matches spark-duck") {
      val expected = Canon.ofDf(duck.run(q)._1)
      val got      = Canon.ofDf(grain.run(q)._1)
      assert(got == expected, s"grain mismatch on ${q.name}")
    }

    for ((cfgName, cfg) <- Seq("duck" -> GrainConfig.Duck, "full" -> GrainConfig.Full)) {
      test(s"JOB ${q.name}: columnar[$cfgName] matches spark-duck") {
        val expected = Canon.ofDf(duck.run(q)._1)
        val (inter, _) = new ColumnarExec(store, cat, cfg).run(q)
        assert(Canon.ofInter(inter) == expected, s"columnar[$cfgName] mismatch on ${q.name}")
      }
    }
  }

  test("JOB: grain reduces scanned tuples on selective m2m queries") {
    val (_, md) = duck.run(JobQueries.byName("6a"))
    val (_, mg) = grain.run(JobQueries.byName("6a"))
    assert(mg.totalScanned < md.totalScanned,
      s"expected scan reduction, duck=${md.totalScanned} grain=${mg.totalScanned}")
  }
}
