package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** A user-predefined equality join from FK-side table F to PK-side table P
  * (§3). `ridCol` is the system column materialized into F.
  */
final case class PredefJoin(fTable: String, fkCol: String, pTable: String, pkCol: String) {
  def ridCol: String = s"rid_$fkCol"
}

/** RID materialization (§3): the `PREDEFINE JOIN` / `ALTER TABLE` analogue. */
object RidMaterializer {
  /** Dense row IDs: `__rid` = 0..n-1 in `orderCols` order. RIDs are assigned
    * once and then fixed (they are pointers, §6), so assignment is
    * deterministic via a total sort on the primary key.
    */
  def withRid(df: DataFrame, orderCols: Seq[String]): DataFrame = {
    val w = Window.orderBy(orderCols.map(col): _*)
    df.withColumn("__rid", row_number().over(w).cast("long") - 1)
  }

  /** Materialize `rid_<fk>` into F: for each F row the RID of the matching P
    * row, or -1 when the FK dangles (no P row — matches nothing, exactly as
    * the value join would).
    */
  def materialize(f: DataFrame, fkCol: String, p: DataFrame, pkCol: String): DataFrame = {
    val ridCol = s"rid_$fkCol"
    val lookup = p.select(col(pkCol).as("__pk_tmp"), col("__rid").as(ridCol))
    f.join(lookup, col(fkCol) === col("__pk_tmp"), "left")
      .drop("__pk_tmp")
      .withColumn(ridCol, coalesce(col(ridCol), lit(-1L)))
  }
}

/** The predefined-join catalog: raw tables, RID-extended tables, predefined
  * joins, and CSR RID indices. One instance per benchmark database.
  */
final class GrainCatalog(val spark: SparkSession) {
  import scala.collection.mutable

  private val rawTables = mutable.LinkedHashMap[String, DataFrame]()
  private val extTables = mutable.LinkedHashMap[String, DataFrame]()
  private val rowCounts = mutable.LinkedHashMap[String, Long]()
  private val pkColsOf  = mutable.LinkedHashMap[String, Seq[String]]()
  val predefined: mutable.ArrayBuffer[PredefJoin] = mutable.ArrayBuffer()
  /** (fTable, fkCol) -> CSR index keyed by P RIDs. */
  val ridIndices: mutable.LinkedHashMap[(String, String), RidIndexCsr] = mutable.LinkedHashMap()

  /** Register a base table; `pkCols` defines the deterministic RID order. */
  def register(name: String, df: DataFrame, pkCols: Seq[String]): Unit = {
    require(!rawTables.contains(name), s"table $name already registered")
    rawTables(name) = df
    extTables(name) = RidMaterializer.withRid(df, pkCols)
    pkColsOf(name) = pkCols
  }

  /** Single-column primary key, if the table has one (point-lookup index). */
  def pk(name: String): Option[String] =
    pkColsOf.get(name).filter(_.size == 1).map(_.head)

  def predefine(pj: PredefJoin): Unit = {
    require(rawTables.contains(pj.fTable) && rawTables.contains(pj.pTable),
      s"unknown table in $pj")
    extTables(pj.fTable) =
      RidMaterializer.materialize(extTables(pj.fTable), pj.fkCol, extTables(pj.pTable), pj.pkCol)
    predefined += pj
  }

  /** (fTable, fkCol) -> number of dangling FKs (materialized RID = -1).
    * FK-FK RID rewrites are only sound when both sides are dangling-free
    * (otherwise two distinct missing FK values would both map to -1 and
    * spuriously join).
    */
  val danglingCounts: mutable.LinkedHashMap[(String, String), Long] = mutable.LinkedHashMap()

  /** Cache the extended tables; call once after all `predefine`s. */
  def freeze(): Unit = {
    extTables.keys.toSeq.foreach { name =>
      extTables(name) = extTables(name).cache()
      rowCounts(name) = extTables(name).count()
    }
    predefined.foreach { pj =>
      danglingCounts((pj.fTable, pj.fkCol)) =
        extTables(pj.fTable).filter(col(pj.ridCol) === -1L).count()
    }
  }

  def danglingFree(fTable: String, fkCol: String): Boolean =
    danglingCounts.get((fTable, fkCol)).contains(0L)

  def raw(name: String): DataFrame = rawTables(name)
  def ext(name: String): DataFrame = extTables(name)
  def rows(name: String): Long = rowCounts.getOrElseUpdate(name, extTables(name).count())
  def tableNames: Seq[String] = rawTables.keys.toSeq
  def rawMap: Map[String, DataFrame] = rawTables.toMap

  def findPredef(fTable: String, fkCol: String, pTable: String, pkCol: String): Option[PredefJoin] =
    predefined.find(pj =>
      pj.fTable == fTable && pj.fkCol == fkCol && pj.pTable == pTable && pj.pkCol == pkCol)

  /** The *other* predefined join on a two-FK relationship table, if any —
    * what makes the extended index (§5.2) possible.
    */
  def otherPredef(pj: PredefJoin): Option[PredefJoin] =
    predefined.find(o => o.fTable == pj.fTable && o.fkCol != pj.fkCol)

  /** Build the (possibly extended) RID index on (fTable, fkCol) (§5).
    * Collected to the driver as int arrays — the paper also keeps these
    * in-memory in CSR form.
    *
    * @param extendedWith the second FK column of the relationship table to
    *        extend the index with (§5.2) — pass it explicitly so tables with
    *        more than two FKs never get an accidental wrong pairing
    */
  def buildRidIndex(fTable: String, fkCol: String,
                    extendedWith: Option[String] = None): RidIndexCsr = {
    val pj = predefined.find(p => p.fTable == fTable && p.fkCol == fkCol)
      .getOrElse(sys.error(s"no predefined join on $fTable.$fkCol"))
    val otherCol = extendedWith.map { oc =>
      predefined.find(p => p.fTable == fTable && p.fkCol == oc)
        .getOrElse(sys.error(s"no predefined join on $fTable.$oc")).ridCol
    }
    val f = ext(fTable)
    val cols = Seq(col(pj.ridCol).cast("int"), col("__rid").cast("int")) ++
      otherCol.map(c => col(c).cast("int"))
    val rowsArr = f.select(cols: _*).collect()
    val n = rowsArr.length
    val keys = new Array[Int](n); val fs = new Array[Int](n)
    val others = if (otherCol.isDefined) new Array[Int](n) else null
    var i = 0
    while (i < n) {
      val r = rowsArr(i)
      keys(i) = r.getInt(0); fs(i) = r.getInt(1)
      if (others != null) others(i) = r.getInt(2)
      i += 1
    }
    val idx = RidIndexCsr.build(rows(pj.pTable).toInt, keys, fs, others)
    ridIndices((fTable, fkCol)) = idx
    idx
  }

  def ridIndex(fTable: String, fkCol: String): Option[RidIndexCsr] =
    ridIndices.get((fTable, fkCol))
}
