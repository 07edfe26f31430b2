package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import repro.stream.{ThresholdWindow, Windows}

/** Naive baselines: the shape a user of a generic streaming engine
  * (Kafka/Flink per the paper's introduction) writes by hand without a
  * spatiotemporal library — every event tested against *every* zone by
  * generic point-in-polygon, no bounding-box prefilter, no predicate
  * pushdown before window replication.
  *
  * Each baseline is semantically identical to its [[Geofencing]] /
  * [[Gcep]] counterpart (tests assert result equality); Table 2
  * compares their throughput.
  */
object Baselines {

  /** Zone perimeter as a generic polygon ring (the baseline does not
    * know zones are rectangles).
    */
  private val ringCol: Column = array(
    col("xmin"), col("ymin"), col("xmax"), col("ymin"),
    col("xmax"), col("ymax"), col("xmin"), col("ymax"))

  /** Event-in-zone via cross join against ALL zones and ray casting,
    * filtered to `kind` only afterwards.
    */
  private def zoneMembership(events: DataFrame, zones: DataFrame,
                             kind: String): DataFrame =
    events.crossJoin(zones.withColumn("ring", ringCol))
      .withColumn("in_zone", expr("st_point_in_poly(lon, lat, ring)"))
      .where(col("in_zone") && col("kind") === kind)
      .drop("ring", "in_zone")

  /** Q1 baseline — same output as [[Geofencing.alertFiltering]]. */
  def alertFiltering(events: DataFrame, zones: DataFrame): DataFrame = {
    val alerts = events.where(col("alert_type").isNotNull)
      .select("id", "train", "ts_ms", "lon", "lat", "alert_type")
    val inMaint = zoneMembership(alerts, zones, "maintenance")
      .select("id").distinct()
    val dropped = alerts.join(inMaint, Seq("id"), "left_semi")
      .where(col("alert_type") === "SPEED").select("id")
    alerts.join(dropped, Seq("id"), "left_anti")
      .join(inMaint.withColumn("in_maintenance", lit(true)), Seq("id"), "left")
      .withColumn("in_maintenance", coalesce(col("in_maintenance"), lit(false)))
  }

  /** Q2 baseline — same output as [[Geofencing.noiseMonitoring]]. */
  def noiseMonitoring(events: DataFrame, zones: DataFrame,
                      windowMs: Long = 60000L): DataFrame = {
    val inNb = zoneMembership(events, zones, "neighbourhood")
      .select("ts_ms", "zone_id", "noise_db", "lim")
    Windows.tumbling(inNb, "ts_ms", windowMs, Seq("zone_id"),
        Seq(count(lit(1)).as("n_events"), avg("noise_db").as("avg_db"),
          max("noise_db").as("max_db"), max("lim").as("lim")))
      .withColumn("exceeded", col("avg_db") > col("lim"))
  }

  /** Q3 baseline — same output as [[Geofencing.dynamicSpeedLimit]]. */
  def dynamicSpeedLimit(events: DataFrame, zones: DataFrame): DataFrame =
    zoneMembership(events, zones, "curve")
      .where(col("speed_kmh") > col("lim"))
      .select(col("id"), col("train"), col("ts_ms"), col("lon"), col("lat"),
        col("zone_id"), col("speed_kmh"), col("lim").as("suggested_kmh"))

  /** Q7 baseline — same output as [[Gcep.unscheduledStops]]; stop
    * windows are identical, but designated-zone membership of each stop
    * centroid is decided by polygon tests against all zones.
    */
  def unscheduledStops(events: DataFrame, zones: DataFrame,
                       minDurMs: Long = 60000L): DataFrame = {
    val prepared = events.select(col("train").cast("long").as("key"),
      col("ts_ms").as("tsMs"), col("speed_kmh").as("value"),
      col("lon"), col("lat"))
    val stops = ThresholdWindow.batch(prepared, col("value") < 1.0, minDurMs)
    val designatedHits = stops
      .crossJoin(zones.withColumn("ring", ringCol))
      .where(expr("st_point_in_poly(cLon, cLat, ring)") &&
        col("kind").isin("station", "workshop"))
      .select("key", "startMs").distinct()
    stops.join(designatedHits, Seq("key", "startMs"), "left_anti")
      .select(col("key").as("train"), col("startMs"), col("endMs"),
        col("n"), col("cLon"), col("cLat"))
  }

  /** Q8a baseline — same output as [[Gcep.brakePatterns]], but every
    * event (not just emergencies) is replicated into the sliding
    * windows; the emergency predicate is evaluated inside the
    * aggregation (no pushdown).
    */
  def brakePatterns(events: DataFrame,
                    sizeMs: Long = 600000L, slideMs: Long = 120000L,
                    k: Long = 3L): DataFrame = {
    val ev = events.withColumn("segment", Gcep.segmentCol)
      .withColumn("emerg", col("brake_bar") < 2.0)
    Windows.sliding(ev, "ts_ms", sizeMs, slideMs, Seq("segment"),
        Seq(sum(when(col("emerg"), 1L).otherwise(0L)).as("n_events"),
          min(when(col("emerg"), col("ts_ms"))).as("first_ms"),
          max(when(col("emerg"), col("ts_ms"))).as("last_ms")))
      .where(col("n_events") >= k)
  }
}
