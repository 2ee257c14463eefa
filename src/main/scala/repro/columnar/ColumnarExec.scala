package repro.columnar

import org.roaringbitmap.RoaringBitmap
import repro.core._
import scala.collection.mutable

/** Intermediate tuples of the serial engine: prefixed column names + rows. */
final class Inter(val schema: IndexedSeq[String], val rows: mutable.ArrayBuffer[Array[Any]]) {
  private val byName = schema.zipWithIndex.toMap
  def idx(c: String): Int = byName.getOrElse(c, sys.error(s"no column $c in ${schema.mkString(",")}"))
  def size: Int = rows.size
}

/** Execution metrics of the serial engine (Table 4 / §7.3 analyses). */
final class ColMetrics {
  val scanned: mutable.LinkedHashMap[String, Long] = mutable.LinkedHashMap()
  var probes: Long = 0
  var indexLookups: Long = 0
  var zonesSkipped: Long = 0
  def totalScanned: Long = scanned.values.sum
}

/** Serial single-threaded columnar executor — the same-substrate stand-in for
  * DuckDB (config [[GrainConfig.Duck]]) and GRainDB (other configs) in the
  * three-system SNB-M comparison (Tables 5/6/10).
  *
  * Semantics and plan handling mirror [[repro.core.SparkExec]] exactly: left
  * subtree builds, sip passes row/zone bitmasks to probe-side scans, reverse
  * semijoins go through the CSR RID index, and join merging drops eligible
  * relationship leaves. Unlike the Spark engine, zone skipping here is
  * physical: skipped zones are never iterated.
  */
final class ColumnarExec(store: ColumnStore, cat: GrainCatalog, cfg: GrainConfig) {
  private def grain = cfg.ridJoins
  private def pfx(alias: String, c: String) = s"${alias}_$c"

  def run(q: Query, planOverride: Option[Plan] = None): (Inter, ColMetrics) = {
    val m = new ColMetrics
    val plan0 = planOverride.getOrElse(q.plan)
    val (joins, merged, plan) = JoinMerge.preprocess(q, plan0, cat, enabled = grain && cfg.joinMerge)
    val scanFilters = mutable.Map[String, mutable.ArrayBuffer[RoaringBitmap]]()
    merged.foreach(mj => m.scanned(mj.fAlias) = 0L)

    def isRewritten(j: JoinPred): Option[Rewrites.EdgeRewrite] =
      if (!grain) None else Rewrites.resolve(cat, q, j)

    def neededColsOf(alias: String): Seq[String] =
      if (!grain) q.neededCols(alias)
      else {
        val rewrittenCols = joins.filter(_.touches(alias)).flatMap { j =>
          isRewritten(j) match {
            case Some(Rewrites.FkPk(fkAlias, ridCol, _, _)) =>
              if (fkAlias == alias) Seq(ridCol) else Seq.empty
            case Some(fkfk: Rewrites.FkFk) =>
              if (fkfk.aAlias == alias) Seq(fkfk.aRidCol) else Seq(fkfk.bRidCol)
            case None => Seq(j.colOf(alias))
          }
        }
        val outPredCols = q.out.filter(_.alias == alias).map(_.col) ++
          q.agg.toSeq.flatMap(a => a.groupBy.filter(_.alias == alias).map(_.col) ++
            a.aggs.flatMap(_.of).filter(_.alias == alias).map(_.col)) ++
          q.ref(alias).pred.toSeq.flatMap(_.cols)
        (outPredCols ++ rewrittenCols ++ Seq("__rid")).distinct
      }

    def scan(alias: String): Inter = {
      val tname = q.ref(alias).table
      val t = store(tname)
      val needed = neededColsOf(alias).toIndexedSeq
      val colsData = needed.map {
        case "__rid" if !t.has("__rid") => null // virtual: position
        case c                          => t.col(c)
      }
      val pred = q.ref(alias).pred
      def value(ci: Int, row: Int): Any =
        if (colsData(ci) == null) row.toLong else colsData(ci).any(row)
      def getter(row: Int): String => Any = c => {
        val t2 = t
        if (c == "__rid" && !t2.has("__rid")) row.toLong else t2.col(c).any(row)
      }
      val out = mutable.ArrayBuffer[Array[Any]]()
      def emit(row: Int): Unit = {
        if (pred.forall(p => Pred.eval(p, getter(row)))) {
          val arr = new Array[Any](needed.size)
          var ci = 0
          while (ci < needed.size) { arr(ci) = value(ci, row); ci += 1 }
          out += arr
        }
      }

      val filters = scanFilters.getOrElse(alias, mutable.ArrayBuffer.empty)
      val pointKey: Option[Long] = pred.flatMap(pointLookupKey(_, cat.pk(tname)))
      if (filters.isEmpty && pointKey.isDefined) {
        // Primary-key point lookup — what lets DuckDB/GRainDB beat the
        // GDBMS's sequential node scan on IS1/IS4-style queries (§7.2.2).
        val matches = t.index(cat.pk(tname).get).getOrElse(pointKey.get, Array.empty[Int])
        m.scanned(alias) = matches.length.toLong
        m.indexLookups += 1
        matches.foreach(emit)
      } else if (filters.isEmpty) {
        m.scanned(alias) = t.numRows.toLong
        var i = 0
        while (i < t.numRows) { emit(i); i += 1 }
      } else {
        // ScanSJ: zone bitmask skips blocks entirely; row bitmask semi-joins.
        // The scanned-tuples metric counts rows surviving the row bitmask
        // (what flows into predicate evaluation), matching the granularity
        // of the paper's Table 4 scan reductions.
        val combined = filters.reduce((x, y) => RoaringBitmap.and(x, y))
        val zones = Bitmap.zones(combined)
        val zs = Bitmap.ZoneSize
        val nZones = (t.numRows + zs - 1) / zs
        var scanned = 0L
        var z = 0
        while (z < nZones) {
          if (zones.contains(z)) {
            val end = math.min((z + 1) * zs, t.numRows)
            var i = z * zs
            while (i < end) { if (combined.contains(i)) { scanned += 1; emit(i) }; i += 1 }
          } else m.zonesSkipped += 1
          z += 1
        }
        m.scanned(alias) = scanned
      }
      new Inter(needed.map(c => pfx(alias, c)), out)
    }

    def bitmapOf(in: Inter, colName: String): RoaringBitmap = {
      val ci = in.idx(colName)
      val bm = new RoaringBitmap()
      in.rows.foreach { r =>
        val v = r(ci).asInstanceOf[Long]
        if (v >= 0 && v <= Int.MaxValue) bm.add(v.toInt)
      }
      bm
    }

    def hashJoin(l: Inter, r: Inter, keys: Seq[(String, String)]): Inter = {
      val (lk0, rk0) = keys.head
      val li = l.idx(lk0); val ri = r.idx(rk0)
      val extraKeys = keys.tail.map { case (lk, rk) => (l.idx(lk), r.idx(rk)) }
      val ht = mutable.HashMap[Any, mutable.ArrayBuffer[Array[Any]]]()
      l.rows.foreach(row => ht.getOrElseUpdate(row(li), mutable.ArrayBuffer[Array[Any]]()) += row)
      val out = mutable.ArrayBuffer[Array[Any]]()
      r.rows.foreach { rrow =>
        m.probes += 1
        ht.get(rrow(ri)).foreach(_.foreach { lrow =>
          if (extraKeys.forall { case (lei, rei) => lrow(lei) == rrow(rei) }) {
            out += (lrow ++ rrow)
          }
        })
      }
      new Inter(l.schema ++ r.schema, out)
    }

    def exec(p: Plan): Inter = p match {
      case Lf(a) => scan(a)
      case Jn(pl, pr) =>
        val interL = exec(pl)
        val lSet = pl.aliases.toSet
        val rSet = pr.aliases.toSet
        val connecting = joins.filter(j => (lSet(j.a) && rSet(j.b)) || (lSet(j.b) && rSet(j.a)))
        val connectingMerged = merged.filter(mj =>
          (lSet(mj.a) && rSet(mj.b)) || (lSet(mj.b) && rSet(mj.a)))

        if (grain && cfg.sip) {
          connecting.foreach { j =>
            isRewritten(j).foreach {
              case Rewrites.FkPk(fkAlias, ridCol, pkAlias, fkCol) =>
                if (lSet(fkAlias)) {
                  scanFilters.getOrElseUpdate(pkAlias, mutable.ArrayBuffer.empty) +=
                    bitmapOf(interL, pfx(fkAlias, ridCol))
                } else if (cfg.reverseSemijoin) {
                  cat.ridIndex(q.ref(fkAlias).table, fkCol).foreach { idx =>
                    scanFilters.getOrElseUpdate(fkAlias, mutable.ArrayBuffer.empty) +=
                      idx.mapToF(bitmapOf(interL, pfx(pkAlias, "__rid")))
                  }
                }
              case fkfk: Rewrites.FkFk if cfg.reverseSemijoin =>
                val (lAlias, lRid, rAlias, rFkCol) =
                  if (lSet(fkfk.aAlias)) (fkfk.aAlias, fkfk.aRidCol, fkfk.bAlias, fkfk.bFkCol)
                  else (fkfk.bAlias, fkfk.bRidCol, fkfk.aAlias, fkfk.aFkCol)
                cat.ridIndex(q.ref(rAlias).table, rFkCol).foreach { idx =>
                  scanFilters.getOrElseUpdate(rAlias, mutable.ArrayBuffer.empty) +=
                    idx.mapToF(bitmapOf(interL, pfx(lAlias, lRid)))
                }
              case _: Rewrites.FkFk => // index use disabled in this config
            }
          }
          connectingMerged.foreach { mj =>
            val (aAlias, bAlias, aFk) =
              if (lSet(mj.a)) (mj.a, mj.b, mj.aFk) else (mj.b, mj.a, mj.bFk)
            cat.ridIndex(mj.fTable, aFk).filter(_.extended).foreach { idx =>
              scanFilters.getOrElseUpdate(bAlias, mutable.ArrayBuffer.empty) +=
                idx.mapToOther(bitmapOf(interL, pfx(aAlias, "__rid")))
            }
          }
        }

        val interR = exec(pr)

        require(connectingMerged.size <= 1,
          s"${q.name}: at most one merged edge may bind per join node")
        connectingMerged.headOption match {
          case Some(mj) =>
            val (aAlias, bAlias, aFk) =
              if (lSet(mj.a)) (mj.a, mj.b, mj.aFk) else (mj.b, mj.a, mj.bFk)
            val idx = cat.ridIndex(mj.fTable, aFk).filter(_.extended)
              .getOrElse(sys.error(s"join merge needs extended index on ${mj.fTable}.$aFk"))
            // SJoinIdxM: pairs come straight from the extended index.
            val lById = mutable.HashMap[Long, mutable.ArrayBuffer[Array[Any]]]()
            val lri = interL.idx(pfx(aAlias, "__rid"))
            interL.rows.foreach(row =>
              lById.getOrElseUpdate(row(lri).asInstanceOf[Long], mutable.ArrayBuffer[Array[Any]]()) += row)
            val rById = mutable.HashMap[Long, mutable.ArrayBuffer[Array[Any]]]()
            val rri = interR.idx(pfx(bAlias, "__rid"))
            interR.rows.foreach(row =>
              rById.getOrElseUpdate(row(rri).asInstanceOf[Long], mutable.ArrayBuffer[Array[Any]]()) += row)
            val (ks, os) = idx.pairsFor(bitmapOf(interL, pfx(aAlias, "__rid")))
            val out = mutable.ArrayBuffer[Array[Any]]()
            var i = 0
            while (i < ks.length) {
              m.indexLookups += 1
              (lById.get(ks(i).toLong), rById.get(os(i).toLong)) match {
                case (Some(ls), Some(rs)) =>
                  ls.foreach(lr => rs.foreach(rr => out += (lr ++ rr)))
                case _ =>
              }
              i += 1
            }
            var joined = new Inter(interL.schema ++ interR.schema, out)
            if (connecting.nonEmpty) {
              val conds = connecting.map(condOf(joined, _))
              joined = new Inter(joined.schema, joined.rows.filter(r => conds.forall(_(r))))
            }
            joined
          case None =>
            if (connecting.isEmpty) {
              val out = mutable.ArrayBuffer[Array[Any]]()
              interL.rows.foreach(lr => interR.rows.foreach(rr => out += (lr ++ rr)))
              new Inter(interL.schema ++ interR.schema, out)
            } else {
              val keys = connecting.map { j =>
                isRewritten(j) match {
                  case Some(Rewrites.FkPk(fkAlias, ridCol, pkAlias, _)) =>
                    if (lSet(fkAlias)) (pfx(fkAlias, ridCol), pfx(pkAlias, "__rid"))
                    else (pfx(pkAlias, "__rid"), pfx(fkAlias, ridCol))
                  case Some(fkfk: Rewrites.FkFk) =>
                    if (lSet(fkfk.aAlias)) (pfx(fkfk.aAlias, fkfk.aRidCol), pfx(fkfk.bAlias, fkfk.bRidCol))
                    else (pfx(fkfk.bAlias, fkfk.bRidCol), pfx(fkfk.aAlias, fkfk.aRidCol))
                  case None =>
                    if (lSet(j.a)) (pfx(j.a, j.acol), pfx(j.b, j.bcol))
                    else (pfx(j.b, j.bcol), pfx(j.a, j.acol))
                }
              }
              hashJoin(interL, interR, keys)
            }
        }
    }

    def condOf(in: Inter, j: JoinPred): Array[Any] => Boolean =
      isRewritten(j) match {
        case Some(Rewrites.FkPk(fkAlias, ridCol, pkAlias, _)) =>
          val a = in.idx(pfx(fkAlias, ridCol)); val b = in.idx(pfx(pkAlias, "__rid"))
          r => r(a) == r(b)
        case Some(fkfk: Rewrites.FkFk) =>
          val a = in.idx(pfx(fkfk.aAlias, fkfk.aRidCol))
          val b = in.idx(pfx(fkfk.bAlias, fkfk.bRidCol))
          r => r(a) == r(b)
        case None =>
          val a = in.idx(pfx(j.a, j.acol)); val b = in.idx(pfx(j.b, j.bcol))
          r => r(a) == r(b)
      }

    val spj = exec(plan)
    q.agg match {
      case None =>
        val outIdx = q.out.map(oc => spj.idx(oc.name)).toArray
        val projected = spj.rows.map(r => outIdx.map(r))
        (new Inter(q.out.map(_.name).toIndexedSeq, projected), m)
      case Some(a) =>
        // Global aggregates only (what JOB-lite needs); grouped aggregates
        // run on the Spark engine.
        require(a.groupBy.isEmpty, "the serial engine supports global aggregates only")
        val row: Array[Any] = a.aggs.map { ae =>
          ae.fn match {
            case "countstar" => spj.size.toLong
            case "count" =>
              val ci = spj.idx(ae.of.get.name)
              spj.rows.count(_(ci) != null).toLong
            case "min" | "max" =>
              val ci = spj.idx(ae.of.get.name)
              val vs = spj.rows.iterator.map(_(ci)).filter(_ != null).toSeq
              if (vs.isEmpty) null
              else {
                val sorted = vs.head match {
                  case _: Long   => vs.asInstanceOf[Seq[Long]].sorted
                  case _: Double => vs.asInstanceOf[Seq[Double]].sorted
                  case _: String => vs.asInstanceOf[Seq[String]].sorted
                  case x         => sys.error(s"cannot aggregate $x")
                }
                if (ae.fn == "min") sorted.head else sorted.last
              }
            case other => sys.error(s"columnar engine does not aggregate with $other")
          }
        }.toArray
        (new Inter(a.aggs.map(_.as).toIndexedSeq, mutable.ArrayBuffer(row)), m)
    }
  }

  /** Top-level equality on the table's PK (conjuncts allowed). */
  private def pointLookupKey(p: Pred, pk: Option[String]): Option[Long] = pk.flatMap { k =>
    p match {
      case Cmp(c, OpEq, LL(v)) if c == k => Some(v)
      case AndP(ps)                      => ps.collectFirst { case Cmp(c, OpEq, LL(v)) if c == k => v }
      case _                             => None
    }
  }
}

