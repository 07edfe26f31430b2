package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Harness

/** Regenerates Table 1 (per-query ingestion throughput, paper §3.1–3.2).
  *
  * Usage: spark-submit --class repro.jobs.ThroughputTable repro.jar [sf]
  */
object ThroughputTable {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("throughput-table")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val (ev, zones, weather) = Harness.inputs(spark, sf)
      val chunks = Harness.toChunks(ev)
      val streaming = Harness.runT1Streaming(spark, chunks, weather)
      val batch = Harness.runT1Batch(spark, ev, zones, weather)
      print(Harness.formatT1(streaming, batch, sf))
    } finally spark.stop()
  }
}
