package repro.jobs

import repro.core._
import repro.tpch.TpchQueries

/** Table 9 — TPC-H-lite, DuckDB-mode vs GRainDB-mode on Spark.
  *
  *   spark-submit --class repro.jobs.TpchTable repro.jar [sf]
  */
object TpchTable {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.05)
    val spark = JobSession.make("tpch-table-9")
    val cat = TpchQueries.catalog(spark, sf)
    val duck  = new SparkExec(cat, GrainConfig.Duck)
    val grain = new SparkExec(cat, GrainConfig.Full)
    println(f"${"query"}%-5s ${"duck(ms)"}%10s ${"grain(ms)"}%10s ${"factor"}%8s")
    TpchQueries.queries.foreach { q =>
      val d = Bench.timeMs(1, 2)(duck.run(q))
      val g = Bench.timeMs(1, 2)(grain.run(q))
      println(f"${q.name}%-5s $d%10.1f $g%10.1f ${d / g}%7.1fx")
    }
    spark.stop()
  }
}

/** Table 7 — plan-spectrum study on JOB-lite Q1a–Q6b.
  *
  *   spark-submit --class repro.jobs.SpectrumTable repro.jar [scale] [orderCap]
  */
object SpectrumTable {
  import repro.columnar.ColumnarExec
  import repro.imdb.{ImdbData, JobQueries}

  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val cap = args.lift(1).map(_.toInt).getOrElse(40)
    val spark = JobSession.make("spectrum-table-7")
    val cat = ImdbData.catalog(spark, scale)
    val store = ImdbData.store(cat)
    val grain = new ColumnarExec(store, cat, GrainConfig.Full)
    println(f"${"query"}%-6s ${"P*_Duck"}%9s ${"P*_opt"}%9s ${"plans"}%6s")
    JobQueries.spectrumNames.foreach { name =>
      val q = JobQueries.byName(name)
      grain.run(q) // warm-up
      val pDuckStar = Bench.timeMs(1, 3)(grain.run(q))
      val orders = QueryIR.enumerateOrders(q, cap)
      val best = orders.map { o =>
        Bench.timeMs(1, 1)(grain.run(q, Some(QueryIR.leftDeep(o))))
      }.min
      println(f"$name%-6s $pDuckStar%9.2f $best%9.2f ${orders.size}%6d")
    }
    spark.stop()
  }
}
