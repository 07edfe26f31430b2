package repro.stream

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** NebulaStream-style window operators over event streams.
  *
  * Tumbling and sliding windows are thin wrappers over Spark's
  * event-time `window()` (same semantics as NebulaStream's time-based
  * windows: aligned to the epoch, size + slide). Threshold windows —
  * NebulaStream's predicate-delimited windows, which open while a
  * predicate holds and close when it stops holding — have no Catalyst
  * primitive; [[ThresholdWindow]] provides a batch (gaps-and-islands)
  * and a streaming (`flatMapGroupsWithState`) implementation.
  *
  * All helpers key windows on epoch-millisecond `LongType` columns so
  * outputs stay oracle-comparable (DuckDB reproduces the assignment
  * with integer arithmetic).
  */
object Windows {

  /** Start of the tumbling window of `sizeMs` containing `tsMs` (epoch
    * aligned, like NebulaStream/Spark tumbling windows).
    */
  def tumbleStart(tsMs: Column, sizeMs: Long): Column =
    (tsMs.cast("long") / sizeMs).cast("long") * sizeMs

  /** Tumbling-window aggregation: `groupBy(win_start, keys).agg(...)`.
    * Output carries `win_start` (epoch ms) plus the key and agg columns.
    */
  def tumbling(df: DataFrame, tsMsCol: String, sizeMs: Long,
               keys: Seq[String], aggs: Seq[Column]): DataFrame = {
    val g = df.withColumn("win_start", tumbleStart(col(tsMsCol), sizeMs))
    g.groupBy((col("win_start") +: keys.map(col)): _*).agg(aggs.head, aggs.tail: _*)
  }

  /** Sliding-window aggregation with window `sizeMs` and slide
    * `slideMs` (sizeMs must be a multiple of slideMs). Each event lands
    * in `sizeMs / slideMs` windows; implemented by explicit replication
    * so the same plan runs in batch and streaming and the oracle can
    * mirror it with a cross join on offsets.
    */
  def sliding(df: DataFrame, tsMsCol: String, sizeMs: Long, slideMs: Long,
              keys: Seq[String], aggs: Seq[Column]): DataFrame = {
    require(sizeMs % slideMs == 0, s"sizeMs=$sizeMs must be a multiple of slideMs=$slideMs")
    val k = (sizeMs / slideMs).toInt
    val replicated = df
      .withColumn("_off", explode(sequence(lit(0), lit(k - 1))))
      .withColumn("win_start",
        ((col(tsMsCol).cast("long") / slideMs).cast("long") - col("_off")) * slideMs)
      // A window [ws, ws+size) contains ts iff ws <= ts < ws+size; the
      // subtraction above can only under-shoot, so keep valid rows only.
      .where(col(tsMsCol) >= col("win_start") &&
             col(tsMsCol) < col("win_start") + sizeMs)
      .drop("_off")
    replicated.groupBy((col("win_start") +: keys.map(col)): _*).agg(aggs.head, aggs.tail: _*)
  }

  /** Gaps-and-islands annotation: for rows ordered by `tsMsCol` within
    * each key, assign an `island_id` that increments whenever `pred`
    * changes value, then keep only rows where `pred` holds. Each
    * surviving island is one threshold window.
    */
  def islands(df: DataFrame, keys: Seq[String], tsMsCol: String, pred: Column): DataFrame = {
    val w = Window.partitionBy(keys.map(col): _*).orderBy(col(tsMsCol))
    df.withColumn("_pred", pred)
      .withColumn("_chg",
        when(lag(col("_pred"), 1).over(w).isNull ||
             lag(col("_pred"), 1).over(w) =!= col("_pred"), 1).otherwise(0))
      .withColumn("island_id", sum(col("_chg")).over(
        w.rowsBetween(Window.unboundedPreceding, Window.currentRow)))
      .where(col("_pred"))
      .drop("_pred", "_chg")
  }
}
