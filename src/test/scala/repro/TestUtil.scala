package repro

import org.apache.spark.sql.DataFrame
import repro.columnar.Inter

/** Cross-engine result canonicalization: rows → sorted Seq of string-vectors
  * using the same normalization as [[Oracle]] (doubles to 6 decimals, nulls
  * as ∅), with columns sorted by name so engines may emit columns in any
  * order.
  */
object Canon {
  def cell(v: Any): String = v match {
    case null                     => "∅"
    case d: Double                => f"$d%.6f"
    case f: Float                 => f"${f.toDouble}%.6f"
    case bd: java.math.BigDecimal => f"${bd.doubleValue}%.6f"
    case x                        => x.toString
  }

  def of(cols: Seq[String], rows: Seq[Seq[Any]]): Seq[Seq[String]] = {
    val order = cols.sorted
    val idx   = order.map(cols.indexOf(_))
    rows.map(r => idx.map(i => cell(r(i)))).sortBy(_.mkString(""))
  }

  def ofDf(df: DataFrame): Seq[Seq[String]] =
    of(df.columns.toSeq, df.collect().toSeq.map(_.toSeq))

  def ofInter(in: Inter): Seq[Seq[String]] =
    of(in.schema, in.rows.toSeq.map(_.toSeq))
}
