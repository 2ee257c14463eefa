package repro.columnar

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.types._
import scala.collection.mutable

/** A column of an in-memory table. Three runtime types mirror [[repro.core.Lit]]. */
sealed trait ColData {
  def size: Int
  def any(i: Int): Any
}
final case class LongCol(a: Array[Long]) extends ColData {
  def size: Int = a.length; def any(i: Int): Any = a(i)
}
final case class DoubleCol(a: Array[Double]) extends ColData {
  def size: Int = a.length; def any(i: Int): Any = a(i)
}
final case class StringCol(a: Array[String]) extends ColData {
  def size: Int = a.length; def any(i: Int): Any = a(i)
}

/** One in-memory columnar table: the serial engine's storage, loaded once
  * from the RID-extended Spark DataFrame in `__rid` order so that array
  * position == RID (RIDs are virtual positional offsets, §3).
  */
final class TableData(val name: String, val colNames: IndexedSeq[String],
                      val cols: IndexedSeq[ColData], val numRows: Int) {
  private val byName = colNames.zipWithIndex.toMap
  def col(c: String): ColData = cols(byName.getOrElse(c, sys.error(s"$name: no column $c")))
  def has(c: String): Boolean = byName.contains(c)

  /** value -> row ids; the adjacency-list-index analogue used for INLJ. */
  private val valueIdx = mutable.HashMap[String, mutable.HashMap[Long, Array[Int]]]()
  def index(c: String): mutable.HashMap[Long, Array[Int]] =
    valueIdx.getOrElseUpdate(c, {
      val lc = col(c) match {
        case LongCol(a) => a
        case _          => sys.error(s"$name.$c: value index needs a long column")
      }
      val tmp = mutable.HashMap[Long, mutable.ArrayBuffer[Int]]()
      var i = 0
      while (i < lc.length) {
        tmp.getOrElseUpdate(lc(i), mutable.ArrayBuffer[Int]()) += i
        i += 1
      }
      val out = mutable.HashMap[Long, Array[Int]]()
      tmp.foreach { case (k, v) => out(k) = v.toArray }
      out
    })
}

/** The serial engine's database: tables loaded from (extended) DataFrames. */
final class ColumnStore {
  val tables: mutable.LinkedHashMap[String, TableData] = mutable.LinkedHashMap()

  def apply(name: String): TableData = tables(name)

  /** Load a DataFrame (ordered by `__rid` when present, so array index ==
    * RID). Dates and any unrecognised types are stored as strings.
    */
  def load(name: String, df: DataFrame): TableData = {
    val ordered = if (df.columns.contains("__rid")) df.orderBy("__rid") else df
    val rows = ordered.collect()
    val n = rows.length
    val fields = ordered.schema.fields
    val cols: IndexedSeq[ColData] = fields.zipWithIndex.map { case (f, ci) =>
      f.dataType match {
        case LongType | IntegerType | ShortType | ByteType =>
          val a = new Array[Long](n)
          var i = 0
          while (i < n) {
            val v = rows(i).get(ci)
            a(i) = v match {
              case null       => -1L
              case x: Long    => x
              case x: Int     => x.toLong
              case x: Short   => x.toLong
              case x: Byte    => x.toLong
              case x: Number  => x.longValue()
            }
            i += 1
          }
          LongCol(a)
        case DoubleType | FloatType | _: DecimalType =>
          val a = new Array[Double](n)
          var i = 0
          while (i < n) {
            val v = rows(i).get(ci)
            a(i) = if (v == null) Double.NaN else v.asInstanceOf[Number].doubleValue()
            i += 1
          }
          DoubleCol(a)
        case _ =>
          val a = new Array[String](n)
          var i = 0
          while (i < n) { a(i) = Option(rows(i).get(ci)).map(_.toString).orNull; i += 1 }
          StringCol(a)
      }
    }.toIndexedSeq
    val t = new TableData(name, fields.map(_.name).toIndexedSeq, cols, n)
    tables(name) = t
    t
  }
}
