package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.columnar.ColumnarExec
import repro.imdb.JobQueries

/** Tables 3, 4 and 8: JOB-lite runtimes and scan reductions, DuckDB-mode vs
  * GRainDB-mode on the shared serial columnar substrate (the paper compares
  * exactly these two systems here).
  */
class JobBenchTable3_4_8 extends AnyFunSuite {

  test("Table 3/4/8: JOB runtimes, factors, scan reductions") {
    val cat = BenchData.imdbCat
    val store = BenchData.imdbStore
    val duck  = new ColumnarExec(store, cat, GrainConfig.Duck)
    val grain = new ColumnarExec(store, cat, GrainConfig.Full)

    JobQueries.queries.foreach { q => duck.run(q); grain.run(q) } // JIT warm-up

    case class Row(name: String, duckMs: Double, grainMs: Double,
                   scanDuck: Long, scanGrain: Long) {
      def factor: Double = duckMs / grainMs
      def scanRed: Double = scanDuck.toDouble / math.max(1L, scanGrain)
    }

    val rows = JobQueries.queries.map { q =>
      val duckMs  = Bench.timeMs(warmup = 1, runs = 3)(duck.run(q))
      val grainMs = Bench.timeMs(warmup = 1, runs = 3)(grain.run(q))
      val sd = duck.run(q)._2.totalScanned
      val sg = grain.run(q)._2.totalScanned
      Row(q.name, duckMs, grainMs, sd, sg)
    }

    val sb = new StringBuilder
    sb ++= "== Table 4/8: JOB-lite per-query runtimes (ms) ==\n"
    sb ++= f"${"query"}%-6s ${"duck"}%9s ${"grain"}%9s ${"factor"}%8s ${"scanRed"}%9s" +
      f"   | paper: ${"duck"}%8s ${"grain"}%8s ${"factor"}%7s ${"scanRed"}%8s\n"
    rows.foreach { r =>
      val p = PaperNumbers.job.get(r.name)
      val paperStr = p.map { case (d, g, f, s) =>
        val sStr = if (s.isNaN) "-" else f"$s%.1fx"
        f"$d%8.1f $g%8.1f $f%6.1fx $sStr%8s"
      }.getOrElse("")
      sb ++= f"${r.name}%-6s ${r.duckMs}%9.2f ${r.grainMs}%9.2f ${r.factor}%7.1fx " +
        f"${r.scanRed}%8.1fx   | paper: $paperStr\n"
    }
    sb ++= "\n== Table 3: JOB percentile runtimes (5/25/50/75/95, ms) ==\n"
    sb ++= Bench.percentileRow("DuckDB", rows.map(_.duckMs)) + "\n"
    sb ++= Bench.percentileRow("GRainDB", rows.map(_.grainMs)) + "\n"
    val pd = PaperNumbers.jobPercentiles("DuckDB"); val pg = PaperNumbers.jobPercentiles("GRainDB")
    sb ++= f"paper (25/50/75): DuckDB ${pd._1}%.1f/${pd._2}%.1f/${pd._3}%.1f  " +
      f"GRainDB ${pg._1}%.1f/${pg._2}%.1f/${pg._3}%.1f\n"
    val med = (xs: Seq[Double]) => Bench.percentile(xs, 50)
    sb ++= f"median speedup: measured ${med(rows.map(_.duckMs)) / med(rows.map(_.grainMs))}%.1fx, paper 3.6x\n"
    Bench.report("table3_4_8_job.txt", sb.toString)

    // Shape assertions: GRainDB wins overall and on the selective queries.
    assert(med(rows.map(_.grainMs)) < med(rows.map(_.duckMs)),
      "GRainDB-mode must beat DuckDB-mode at the median on JOB")
    val byName = rows.map(r => r.name -> r).toMap
    Seq("6a", "21a", "27a", "32a").foreach { n =>
      assert(byName(n).factor > 1.0, s"$n expected a speedup")
      assert(byName(n).scanRed > 10.0, s"$n expected a large scan reduction")
    }
    assert(byName("5a").scanRed < byName("6a").scanRed / 10,
      "5a (relationship-side predicates only) must show far less scan reduction")
  }
}
