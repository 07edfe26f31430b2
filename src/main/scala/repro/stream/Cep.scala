package repro.stream

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Geospatial complex event processing primitives (after Ziehn [10],
  * which NebulaMEOS extends): pattern detection over keyed event
  * streams expressed as Catalyst plans so they run in batch and
  * streaming alike.
  */
object Cep {

  /** Count pattern: fire when at least `k` events satisfying `pred`
    * fall in one sliding window (`sizeMs`, `slideMs`) for a key group.
    * The GCEP shape behind "repeated emergency brakes in a segment".
    */
  def countPattern(df: DataFrame, keys: Seq[String], tsMsCol: String,
                   pred: Column, sizeMs: Long, slideMs: Long, k: Long): DataFrame =
    Windows.sliding(df.where(pred), tsMsCol, sizeMs, slideMs, keys,
        Seq(count(lit(1)).as("n_events"),
            min(tsMsCol).as("first_ms"), max(tsMsCol).as("last_ms")))
      .where(col("n_events") >= k)

  /** Sequence pattern A ~> B within `maxGapMs` on the same key: every
    * (a, b) pair where b follows a within the gap. `keys` must exist in
    * both inputs; other columns are prefixed `a_` / `b_`.
    */
  def followedBy(dfA: DataFrame, dfB: DataFrame, keys: Seq[String],
                 tsMsCol: String, maxGapMs: Long): DataFrame = {
    val a = dfA.columns.foldLeft(dfA)((d, c) =>
      if (keys.contains(c)) d else d.withColumnRenamed(c, s"a_$c"))
    val b = dfB.columns.foldLeft(dfB)((d, c) =>
      if (keys.contains(c)) d else d.withColumnRenamed(c, s"b_$c"))
    a.join(b, keys)
      .where(col(s"b_$tsMsCol") >= col(s"a_$tsMsCol") &&
             col(s"b_$tsMsCol") <= col(s"a_$tsMsCol") + maxGapMs)
  }
}
