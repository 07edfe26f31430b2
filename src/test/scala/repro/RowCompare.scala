package repro

import org.apache.spark.sql.DataFrame

/** Order- and column-order-insensitive result comparison between two
  * Spark DataFrames (used for MEOS-vs-baseline and batch-vs-streaming
  * equivalence; doubles canonicalized to 6 decimals like [[Oracle]]).
  */
object RowCompare {

  def canon(df: DataFrame): Seq[Seq[String]] = {
    val cols = df.columns.toSeq
    val order = cols.map(_.toLowerCase).sorted
    val idx = order.map(c => cols.indexWhere(_.toLowerCase == c))
    df.collect().toSeq
      .map(r => idx.map { i =>
        r.get(i) match {
          case null => "∅"
          case d: Double => f"$d%.6f"
          case f: Float => f"${f.toDouble}%.6f"
          case bd: java.math.BigDecimal => f"${bd.doubleValue}%.6f"
          case x => x.toString
        }
      })
      .sortBy(_.mkString("|"))
  }

  /** Assert both frames hold the same rows (modulo order and column
    * order; columns must have the same case-insensitive names).
    */
  def assertSameRows(a: DataFrame, b: DataFrame): Unit = {
    require(a.columns.map(_.toLowerCase).sorted.toSeq ==
      b.columns.map(_.toLowerCase).sorted.toSeq,
      s"column mismatch: ${a.columns.sorted.toSeq} vs ${b.columns.sorted.toSeq}")
    val ca = canon(a); val cb = canon(b)
    assert(ca == cb,
      s"row mismatch (${ca.size} vs ${cb.size}):\n" +
        s"  a-only: ${ca.diff(cb).take(3)}\n  b-only: ${cb.diff(ca).take(3)}")
  }
}
