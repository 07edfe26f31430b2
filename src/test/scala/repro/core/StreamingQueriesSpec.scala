package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, Row}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.streaming.OutputMode

import repro.{RowCompare, SparkSpec, TestData}
import repro.sncb.RailNetwork
import repro.stream.StreamRunner

/** Every streaming formulation must produce the same rows as its batch
  * counterpart when the SF=0.002 stream is replayed through a
  * MemoryStream in time-ordered micro-batches.
  */
class StreamingQueriesSpec extends SparkSpec {

  private lazy val sp = spark
  import sp.implicits._

  private lazy val ev = TestData.events002
  private lazy val zones = TestData.zones

  /** The stream as time-ordered SensorEvent chunks. */
  private lazy val chunks: Seq[Seq[SensorEvent]] = {
    val all = ev.orderBy("ts_ms", "train").collect().map { r =>
      SensorEvent(r.getAs[Long]("id"), r.getAs[Int]("train"), r.getAs[Long]("seq"),
        r.getAs[Long]("ts_ms"), r.getAs[Double]("lon"), r.getAs[Double]("lat"),
        r.getAs[Double]("speed_kmh"), r.getAs[Double]("battery_v"),
        r.getAs[Double]("temp_c"), r.getAs[Double]("brake_bar"),
        r.getAs[Double]("noise_db"), r.getAs[Int]("passengers"),
        Option(r.getAs[String]("alert_type")))
    }.toSeq
    all.grouped(3000).toSeq
  }

  private def runStream(q: DataFrame => DataFrame, mode: OutputMode,
                        name: String): DataFrame = {
    val rows = StreamRunner.runCollect[SensorEvent](spark, chunks,
      (ds: Dataset[SensorEvent]) => q(ds.toDF()), mode, name)
    val schema = spark.table(name).schema
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toList), schema)
  }

  test("Q1 streaming equals batch") {
    val got = runStream(Streaming.alertFiltering(_, RailNetwork.maintenance),
      OutputMode.Append(), "sq1")
    RowCompare.assertSameRows(got, Geofencing.alertFiltering(ev, zones))
  }

  test("Q2 streaming equals batch") {
    val got = runStream(Streaming.noiseMonitoring(_, RailNetwork.neighbourhoods),
      OutputMode.Complete(), "sq2")
    RowCompare.assertSameRows(got, Geofencing.noiseMonitoring(ev, zones))
  }

  test("Q3 streaming equals batch") {
    val got = runStream(Streaming.dynamicSpeedLimit(_, RailNetwork.curves),
      OutputMode.Append(), "sq3")
    RowCompare.assertSameRows(got, Geofencing.dynamicSpeedLimit(ev, zones))
  }

  test("Q4 streaming equals batch") {
    val got = runStream(Streaming.weatherSpeedZones(_, TestData.weather),
      OutputMode.Append(), "sq4")
    RowCompare.assertSameRows(got, Geofencing.weatherSpeedZones(ev, TestData.weather))
  }

  test("Q5 streaming equals batch") {
    val got = runStream(Streaming.batteryMonitoring(_, RailNetwork.workshops),
      OutputMode.Complete(), "sq5")
    RowCompare.assertSameRows(got, Gcep.batteryMonitoring(ev, zones))
  }

  test("Q6 streaming equals batch") {
    val got = runStream(Streaming.heavyPassengerLoad(_), OutputMode.Complete(), "sq6")
    RowCompare.assertSameRows(got, Gcep.heavyPassengerLoad(ev))
  }

  test("Q7 streaming equals batch (closed windows)") {
    implicit val s = spark
    val rows = StreamRunner.runCollect[SensorEvent](spark, chunks,
      (ds: Dataset[SensorEvent]) =>
        Streaming.unscheduledStops(ds,
          RailNetwork.stations ++ RailNetwork.workshops),
      OutputMode.Append(), "sq7")
    val schema = spark.table("sq7").schema
    val got = spark.createDataFrame(spark.sparkContext.parallelize(rows.toList), schema)
    // The batch side also reports a window still open at end-of-stream;
    // streaming (correctly) keeps it open. Compare closed windows only.
    val lastTs = ev.agg(max("ts_ms")).head().getLong(0)
    val batch = Gcep.unscheduledStops(ev, zones).where(col("endMs") < lastTs)
    RowCompare.assertSameRows(got, batch)
  }

  test("Q8a streaming equals batch") {
    val got = runStream(Streaming.brakePatterns(_), OutputMode.Complete(), "sq8a")
    RowCompare.assertSameRows(got, Gcep.brakePatterns(ev))
  }

  test("Q8b streaming equals batch (closed windows)") {
    implicit val s = spark
    val rows = StreamRunner.runCollect[SensorEvent](spark, chunks,
      (ds: Dataset[SensorEvent]) => Streaming.persistentLowPressure(ds),
      OutputMode.Append(), "sq8b")
    val schema = spark.table("sq8b").schema
    val got = spark.createDataFrame(spark.sparkContext.parallelize(rows.toList), schema)
    val lastTs = ev.agg(max("ts_ms")).head().getLong(0)
    val batch = Gcep.persistentLowPressure(ev).where(col("endMs") < lastTs)
    RowCompare.assertSameRows(got, batch)
  }
}
