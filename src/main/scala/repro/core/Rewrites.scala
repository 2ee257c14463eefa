package repro.core

/** Resolution of IR join edges against the predefined-join catalog, shared
  * by the Spark and columnar executors.
  */
object Rewrites {
  sealed trait EdgeRewrite

  /** `F.fk = P.pk` → `F.rid_fk = P.__rid` (§4). */
  final case class FkPk(fkAlias: String, ridCol: String, pkAlias: String,
                        fkCol: String) extends EdgeRewrite

  /** `F1.fk1 = F2.fk2` where both FKs point at the same (table, pk):
    * equality of FK values is equality of materialized RIDs, so the join
    * runs on `F1.rid_fk1 = F2.rid_fk2` and sip routes through the RID index
    * of the scan side. Sound only when neither FK dangles.
    */
  final case class FkFk(aAlias: String, aRidCol: String, aFkCol: String,
                        bAlias: String, bRidCol: String, bFkCol: String) extends EdgeRewrite

  def resolve(cat: GrainCatalog, q: Query, j: JoinPred): Option[EdgeRewrite] = {
    val (ta, tb) = (q.ref(j.a).table, q.ref(j.b).table)
    cat.findPredef(ta, j.acol, tb, j.bcol)
      .map(pj => FkPk(j.a, pj.ridCol, j.b, j.acol): EdgeRewrite)
      .orElse(cat.findPredef(tb, j.bcol, ta, j.acol)
        .map(pj => FkPk(j.b, pj.ridCol, j.a, j.bcol): EdgeRewrite))
      .orElse {
        val aPj = cat.predefined.find(p => p.fTable == ta && p.fkCol == j.acol)
        val bPj = cat.predefined.find(p => p.fTable == tb && p.fkCol == j.bcol)
        (aPj, bPj) match {
          case (Some(pa), Some(pb))
              if pa.pTable == pb.pTable && pa.pkCol == pb.pkCol &&
                cat.danglingFree(ta, j.acol) && cat.danglingFree(tb, j.bcol) =>
            Some(FkFk(j.a, pa.ridCol, j.acol, j.b, pb.ridCol, j.bcol))
          case _ => None
        }
      }
  }
}
