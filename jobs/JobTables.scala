package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared session builder for the spark-submit entrypoints. */
object JobSession {
  def make(app: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.sql.shuffle.partitions", 16)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}

/** Tables 3/4/8 — JOB-lite, DuckDB-mode vs GRainDB-mode on the serial
  * columnar substrate.
  *
  *   spark-submit --class repro.jobs.JobTables repro.jar [scale]
  */
object JobTables {
  import repro.core._
  import repro.columnar.ColumnarExec
  import repro.imdb.{ImdbData, JobQueries}

  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = JobSession.make("job-tables-3-4-8")
    val cat = ImdbData.catalog(spark, scale)
    val store = ImdbData.store(cat)
    val duck  = new ColumnarExec(store, cat, GrainConfig.Duck)
    val grain = new ColumnarExec(store, cat, GrainConfig.Full)
    JobQueries.queries.foreach { q => duck.run(q); grain.run(q) } // warm-up
    println(f"${"query"}%-6s ${"duck(ms)"}%10s ${"grain(ms)"}%10s ${"factor"}%8s ${"scanRed"}%9s")
    val results = JobQueries.queries.map { q =>
      val d = Bench.timeMs(1, 3)(duck.run(q))
      val g = Bench.timeMs(1, 3)(grain.run(q))
      val sr = duck.run(q)._2.totalScanned.toDouble /
        math.max(1L, grain.run(q)._2.totalScanned)
      println(f"${q.name}%-6s $d%10.2f $g%10.2f ${d / g}%7.1fx $sr%8.1fx")
      (d, g)
    }
    println("\nTable 3 percentiles (5/25/50/75/95 ms):")
    println(Bench.percentileRow("DuckDB", results.map(_._1)))
    println(Bench.percentileRow("GRainDB", results.map(_._2)))
    spark.stop()
  }
}
