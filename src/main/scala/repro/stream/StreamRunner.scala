package repro.stream

import org.apache.spark.sql.{DataFrame, Dataset, Encoder, Row, SparkSession}
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.streaming.OutputMode

/** Harness for running a query over an in-memory event stream —
  * the reproduction's stand-in for NebulaStream's source/sink runtime.
  *
  * Events are fed through a `MemoryStream` in micro-batch chunks; the
  * query writes to a memory sink. [[measure]] reports end-to-end
  * wall-clock throughput (events/s) for the throughput table.
  */
object StreamRunner {

  /** Run `q` over `chunks` of events fed batch-by-batch; returns the
    * collected sink rows after all input is processed.
    */
  def runCollect[T: Encoder](spark: SparkSession, chunks: Seq[Seq[T]],
                             q: Dataset[T] => DataFrame,
                             outputMode: OutputMode = OutputMode.Append(),
                             name: String = "stream_out"): Seq[Row] = {
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val source = MemoryStream[T]
    val query = q(source.toDS())
      .writeStream.format("memory").queryName(name).outputMode(outputMode).start()
    try {
      chunks.foreach { c => source.addData(c); query.processAllAvailable() }
      spark.table(name).collect().toSeq
    } finally query.stop()
  }

  /** Result of one streaming throughput measurement. */
  final case class Measurement(events: Long, seconds: Double, outRows: Long) {
    def eventsPerSec: Double = events / seconds
  }

  /** Feed `chunks` as micro-batches and measure wall-clock time from
    * first feed to full drain of the sink.
    */
  def measure[T: Encoder](spark: SparkSession, chunks: Seq[Seq[T]],
                          q: Dataset[T] => DataFrame,
                          outputMode: OutputMode = OutputMode.Append(),
                          name: String = "stream_bench"): Measurement = {
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val source = MemoryStream[T]
    val query = q(source.toDS())
      .writeStream.format("memory").queryName(name).outputMode(outputMode).start()
    try {
      val n = chunks.map(_.size.toLong).sum
      val t0 = System.nanoTime()
      chunks.foreach(source.addData(_))
      query.processAllAvailable()
      val secs = (System.nanoTime() - t0) / 1e9
      Measurement(n, secs, spark.table(name).count())
    } finally query.stop()
  }
}
