package repro.jobs

import repro.core._
import repro.columnar.ColumnarExec
import repro.graphsim.GraphflowSim
import repro.ldbc.{LdbcData, SnbQueries}

/** Tables 5/6 — SNB-M on the serial columnar substrate, three systems.
  *
  *   spark-submit --class repro.jobs.SnbTables repro.jar [scale]
  */
object SnbTables {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(3.0)
    val spark = JobSession.make("snb-tables-5-6")
    val cat = LdbcData.catalog(spark, scale)
    val store = LdbcData.store(cat)
    val qs = SnbQueries.queries(LdbcData.scale(scale))
    val duck  = new ColumnarExec(store, cat, GrainConfig.Duck)
    val grain = new ColumnarExec(store, cat, GrainConfig.Full)
    val gf    = new GraphflowSim(store)
    qs.foreach { q => duck.run(q); grain.run(q); gf.run(q) } // warm-up
    println(f"${"query"}%-7s ${"duck(ms)"}%10s ${"grain(ms)"}%10s ${"grainX"}%8s ${"gflow(ms)"}%10s ${"gflowX"}%8s")
    val rows = qs.map { q =>
      val d = Bench.timeMs(1, 3)(duck.run(q))
      val g = Bench.timeMs(1, 3)(grain.run(q))
      val f = Bench.timeMs(1, 3)(gf.run(q))
      println(f"${q.name}%-7s $d%10.2f $g%10.2f ${d / g}%7.1fx $f%10.2f ${d / f}%7.1fx")
      (d, g, f)
    }
    println("\nTable 5 percentiles (5/25/50/75/95 ms):")
    println(Bench.percentileRow("DuckDB", rows.map(_._1)))
    println(Bench.percentileRow("GRainDB", rows.map(_._2)))
    println(Bench.percentileRow("GraphflowDB", rows.map(_._3)))
    spark.stop()
  }
}

/** Table 10 — SNB-M ablation across GrainConfig levels.
  *
  *   spark-submit --class repro.jobs.AblationTable repro.jar [scale]
  */
object AblationTable {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(3.0)
    val spark = JobSession.make("ablation-table-10")
    val cat = LdbcData.catalog(spark, scale)
    val store = LdbcData.store(cat)
    val qs = SnbQueries.queries(LdbcData.scale(scale))
    val configs = Seq("DuckDB" -> GrainConfig.Duck, "GR-JM-RSJ" -> GrainConfig.RidOnly,
      "GR-JM" -> GrainConfig.NoJm, "GR-FULL" -> GrainConfig.Full)
    val execs = configs.map { case (n, c) => n -> new ColumnarExec(store, cat, c) }
    execs.foreach { case (_, e) => qs.foreach(e.run(_)) } // warm-up
    println(f"${"query"}%-7s" + configs.map(c => f"${c._1}%11s").mkString)
    qs.foreach { q =>
      val times = execs.map { case (_, e) => Bench.timeMs(1, 3)(e.run(q)) }
      println(f"${q.name}%-7s" + times.map(t => f"$t%11.2f").mkString)
    }
    spark.stop()
  }
}
