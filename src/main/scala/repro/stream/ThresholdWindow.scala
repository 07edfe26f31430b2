package repro.stream

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}

/** One sensor event entering a threshold window (generic shape: a key,
  * an event time, the thresholded measure, and a position).
  */
final case class ThresholdEvent(key: Long, tsMs: Long, value: Double,
                                lon: Double, lat: Double)

/** A closed threshold window: the maximal run of consecutive events of
  * one key during which the predicate held.
  *
  * @param cLon / cLat centroid of the positions inside the window —
  *   the queries use it as "where did this episode happen".
  */
final case class ThresholdWin(key: Long, startMs: Long, endMs: Long,
                              n: Long, avgValue: Double,
                              cLon: Double, cLat: Double)

private final case class ThresholdState(startMs: Long, endMs: Long, n: Long,
                                        sumValue: Double, sumLon: Double, sumLat: Double)

/** NebulaStream threshold windows: open while `pred(value)` holds,
  * close when it stops holding (or the stream ends for batch input).
  *
  * Two implementations with identical semantics on ordered input:
  *   - [[batch]]: gaps-and-islands over a sorted DataFrame;
  *   - [[streaming]]: `flatMapGroupsWithState` — the Structured
  *     Streaming extension point for custom window semantics, mirroring
  *     the paper's extension of NebulaStream's window operands.
  */
object ThresholdWindow {

  /** Batch threshold windows over columns (`key`, `tsMs`, `value`,
    * `lon`, `lat`); returns one row per window with duration >=
    * `minDurMs`.
    */
  def batch(df: DataFrame, pred: org.apache.spark.sql.Column, minDurMs: Long): DataFrame = {
    val isl = Windows.islands(df, Seq("key"), "tsMs", pred)
    isl.groupBy(col("key"), col("island_id"))
      .agg(
        min("tsMs").as("startMs"), max("tsMs").as("endMs"),
        count(lit(1)).as("n"), avg("value").as("avgValue"),
        avg("lon").as("cLon"), avg("lat").as("cLat"))
      .where(col("endMs") - col("startMs") >= minDurMs)
      .drop("island_id")
  }

  /** Streaming threshold windows via `flatMapGroupsWithState`.
    *
    * Emits a window as soon as an event with `!pred(value)` arrives for
    * the key (append mode). Events within a micro-batch are sorted by
    * event time; cross-batch disorder is not handled (the bench feeds
    * in order, as the train gateway does in the paper's setup).
    */
  def streaming(ds: Dataset[ThresholdEvent], pred: Double => Boolean,
                minDurMs: Long)(implicit spark: SparkSession): Dataset[ThresholdWin] = {
    import spark.implicits._
    ds.groupByKey(_.key)
      .flatMapGroupsWithState[ThresholdState, ThresholdWin](
        OutputMode.Append(), GroupStateTimeout.NoTimeout()) {
        (key: Long, it: Iterator[ThresholdEvent], state: GroupState[ThresholdState]) =>
          val out = scala.collection.mutable.ArrayBuffer.empty[ThresholdWin]
          var st: Option[ThresholdState] = state.getOption
          it.toSeq.sortBy(_.tsMs).foreach { e =>
            if (pred(e.value)) {
              st = Some(st match {
                case Some(s) => ThresholdState(s.startMs, e.tsMs, s.n + 1,
                  s.sumValue + e.value, s.sumLon + e.lon, s.sumLat + e.lat)
                case None => ThresholdState(e.tsMs, e.tsMs, 1, e.value, e.lon, e.lat)
              })
            } else {
              st.foreach { s =>
                if (s.endMs - s.startMs >= minDurMs)
                  out += ThresholdWin(key, s.startMs, s.endMs, s.n,
                    s.sumValue / s.n, s.sumLon / s.n, s.sumLat / s.n)
              }
              st = None
            }
          }
          st match {
            case Some(s) => state.update(s)
            case None => if (state.exists) state.remove()
          }
          out.iterator
      }
  }
}
