package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.columnar.ColumnarExec
import repro.graphsim.GraphflowSim
import repro.ldbc.SnbQueries

/** Tables 5 and 6: the three-system SNB-M comparison on the shared serial
  * columnar substrate — DuckDB-sim (value hash joins), GRainDB-sim
  * (predefined joins: sip + RID index + join merging), GraphflowDB-sim
  * (left-deep INLJ over adjacency indices).
  */
class SnbBenchTable5_6 extends AnyFunSuite {

  test("Table 5/6: SNB-M runtimes for DuckDB / GRainDB / GraphflowDB") {
    val cat = BenchData.snbCat
    val store = BenchData.snbStore
    val qs = SnbQueries.queries(BenchData.snbScaleCfg)
    val duck  = new ColumnarExec(store, cat, GrainConfig.Duck)
    val grain = new ColumnarExec(store, cat, GrainConfig.Full)
    val gf    = new GraphflowSim(store)

    // JIT warm-up over the whole workload before timing anything.
    qs.foreach { q => duck.run(q); grain.run(q); gf.run(q) }

    case class Row(name: String, duckMs: Double, grainMs: Double, gfMs: Double) {
      def grainFactor: Double = duckMs / grainMs
      def gfFactor: Double = duckMs / gfMs
    }
    val rows = qs.map { q =>
      Row(q.name,
        Bench.timeMs(warmup = 1, runs = 3)(duck.run(q)),
        Bench.timeMs(warmup = 1, runs = 3)(grain.run(q)),
        Bench.timeMs(warmup = 1, runs = 3)(gf.run(q)))
    }

    val sb = new StringBuilder
    sb ++= "== Table 6: SNB-M per-query runtimes (ms) ==\n"
    sb ++= f"${"query"}%-7s ${"duck"}%9s ${"grain"}%9s ${"grainX"}%8s ${"gflow"}%9s ${"gflowX"}%8s" +
      "   | paper: duck grain grainX gflow gflowX\n"
    rows.foreach { r =>
      val p = PaperNumbers.snb.get(r.name).map { case (d, g, gx, f, fx) =>
        f"$d%.1f $g%.1f ${gx}%.1fx $f%.1f ${fx}%.2fx"
      }.getOrElse("")
      sb ++= f"${r.name}%-7s ${r.duckMs}%9.2f ${r.grainMs}%9.2f ${r.grainFactor}%7.1fx " +
        f"${r.gfMs}%9.2f ${r.gfFactor}%7.1fx   | paper: $p\n"
    }
    sb ++= "\n== Table 5: SNB-M percentile runtimes (5/25/50/75/95, ms) ==\n"
    sb ++= Bench.percentileRow("DuckDB", rows.map(_.duckMs)) + "\n"
    sb ++= Bench.percentileRow("GRainDB", rows.map(_.grainMs)) + "\n"
    sb ++= Bench.percentileRow("GraphflowDB", rows.map(_.gfMs)) + "\n"
    sb ++= "paper (25/50/75): " + PaperNumbers.snbPercentiles.map { case (k, (a, b, c)) =>
      f"$k $a%.1f/$b%.1f/$c%.1f"
    }.mkString("  ") + "\n"
    val med = (xs: Seq[Double]) => Bench.percentile(xs, 50)
    sb ++= f"median: duck ${med(rows.map(_.duckMs))}%.2f  grain ${med(rows.map(_.grainMs))}%.2f  " +
      f"gflow ${med(rows.map(_.gfMs))}%.2f (paper: 441.8 / 19.6 / 20.8)\n"
    Bench.report("table5_6_snb.txt", sb.toString)

    // Shape assertions (the paper's qualitative claims).
    val byName = rows.map(r => r.name -> r).toMap
    assert(med(rows.map(_.grainMs)) < med(rows.map(_.duckMs)),
      "GRainDB must close most of the gap to DuckDB")
    assert(med(rows.map(_.gfMs)) < med(rows.map(_.duckMs)),
      "GraphflowDB-style INLJ must beat vanilla DuckDB on the graph workload")
    // point lookups: GRainDB (pk index) beats GraphflowDB (sequential scan)
    Seq("IS4", "IS5").foreach { n =>
      assert(byName(n).grainMs < byName(n).gfMs, s"$n: GRainDB should win point lookups")
    }
    // reverse-semijoin queries: GRainDB ≫ DuckDB
    Seq("IS2", "IS7", "IC7", "IC8").foreach { n =>
      assert(byName(n).grainFactor > 2.0, s"$n: expected large GRainDB speedup")
    }
  }
}
