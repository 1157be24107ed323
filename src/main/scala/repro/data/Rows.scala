package repro.data

import org.apache.spark.sql.{DataFrame, Row}

/** Conversions between Spark rows and the engine's column-map tuples, plus
  * a canonical row form for engine-vs-Spark equivalence assertions (the
  * Spark-vs-DuckDB leg is covered by `repro.Oracle`).
  */
object Rows {

  /** Collect a DataFrame into engine-consumable value maps. Dates and
    * timestamps become strings; numerics stay primitive.
    */
  def toMaps(df: DataFrame): Vector[Map[String, Any]] = {
    val cols = df.columns
    df.collect().iterator.map { r =>
      cols.indices.map(i => cols(i) -> convert(r.get(i))).toMap
    }.toVector
  }

  private def convert(v: Any): Any = v match {
    case d: java.sql.Date => d.toString
    case t: java.sql.Timestamp => t.toString
    case bd: java.math.BigDecimal => bd.doubleValue
    case row: Row =>
      row.schema.fieldNames.zip(row.toSeq.map(convert)).toMap
    case s: scala.collection.Seq[_] => s.map(convert).toVector
    case other => other
  }

  /** Canonicalize rows (selected columns, fixed-precision doubles, sorted)
    * so multisets of rows from different systems compare exactly.
    */
  def canonical(rows: Seq[Map[String, Any]], cols: Seq[String]): Seq[Seq[String]] =
    rows.map(r => cols.sorted.map(c => fmt(r.getOrElse(c, null)))).sortBy(_.mkString(""))

  /** Same canonical form from Spark rows. */
  def canonicalDf(df: DataFrame, cols: Seq[String]): Seq[Seq[String]] =
    canonical(toMaps(df.selectExpr(cols: _*)), cols)

  private def fmt(v: Any): String = v match {
    case null => "∅"
    case d: Double => f"$d%.6f"
    case f: Float => f"${f.toDouble}%.6f"
    case bd: java.math.BigDecimal => f"${bd.doubleValue}%.6f"
    case i: Int => i.toLong.toString
    case l: Long => l.toString
    case x => x.toString
  }

  /** Assertion helper with a readable diff. */
  def assertSameRows(
      got: Seq[Map[String, Any]],
      expected: Seq[Map[String, Any]],
      cols: Seq[String],
      what: String): Unit = {
    val g = canonical(got, cols)
    val e = canonical(expected, cols)
    require(g == e,
      s"$what: row mismatch (${g.size} vs ${e.size} rows)\n" +
        s"  only-got:      ${g.diff(e).take(3)}\n" +
        s"  only-expected: ${e.diff(g).take(3)}")
  }
}
