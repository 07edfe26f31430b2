package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._

import repro.meos.ZoneIndex
import repro.sncb.{RailNetwork, TrainData, Zone}
import repro.stream.Windows

/** Geofencing queries Q1–Q4 (paper §3.1), MEOS-style: zone membership
  * through the registered `st_in_box` expression, with a global
  * bounding-box prefilter before the zone join — the pruning MEOS's
  * STBox data structure buys the paper's integration.
  *
  * All functions are pure `DataFrame => DataFrame` transformations and
  * run unchanged on batch and streaming inputs (except where noted).
  * [[repro.core.NebulaMeos.setup]] must have been called on the session.
  */
object Geofencing {

  /** Prefilter: keep only events inside the bounding box of all zones
    * in `zones` (collected once; zone tables are small and static).
    */
  private[core] def bboxPrefilter(events: DataFrame, zones: DataFrame): DataFrame = {
    val Row(x0: Double, x1: Double, y0: Double, y1: Double) =
      zones.agg(min("xmin"), max("xmax"), min("ymin"), max("ymax")).head()
    events.where(expr(s"st_in_box(lon, lat, $x0, $x1, $y0, $y1)"))
  }

  /** Collect a zone table to its catalogue form (zone tables are small
    * and static — the collected list seeds the grid index).
    */
  private[core] def zoneSeq(zones: DataFrame): Seq[Zone] =
    zones.select("zone_id", "kind", "xmin", "xmax", "ymin", "ymax", "lim")
      .collect().toSeq.map(r => Zone(r.getInt(0), r.getString(1), r.getDouble(2),
        r.getDouble(3), r.getDouble(4), r.getDouble(5), r.getDouble(6)))

  /** Events joined to the zones of one `kind` that contain them, via
    * the MEOS-style grid index ([[repro.meos.ZoneIndex]]) behind a
    * bounding-box prefilter. Adds zone_id, kind, lim.
    */
  private[core] def inZonesOfKind(events: DataFrame, zones: DataFrame,
                                  kind: String): DataFrame = {
    val of = zones.where(col("kind") === kind)
    val idx = ZoneIndex.indexDf(events.sparkSession, zoneSeq(of))
    ZoneIndex.join(bboxPrefilter(events, of), idx)
  }

  /** Q1 — Location-Based Alert Filtering: drop non-essential (SPEED)
    * alerts raised inside maintenance zones; annotate the rest with
    * whether they fired in a maintenance zone.
    *
    * Output: id, train, ts_ms, lon, lat, alert_type, in_maintenance.
    */
  def alertFiltering(events: DataFrame, zones: DataFrame): DataFrame = {
    val alerts = events.where(col("alert_type").isNotNull)
      .select("id", "train", "ts_ms", "lon", "lat", "alert_type")
    val inMaint = inZonesOfKind(alerts, zones, "maintenance")
      .select("id", "alert_type").distinct()
    val dropped = inMaint.where(col("alert_type") === "SPEED").select("id")
    alerts.join(dropped, Seq("id"), "left_anti")
      .join(inMaint.select(col("id"), lit(true).as("in_maintenance")), Seq("id"), "left")
      .withColumn("in_maintenance", coalesce(col("in_maintenance"), lit(false)))
  }

  /** Q2 — Location-Based Noise Monitoring: per neighbourhood and
    * tumbling window, aggregate outside-noise readings and flag windows
    * whose average exceeds the neighbourhood's ceiling.
    *
    * Output: win_start, zone_id, n_events, avg_db, max_db, lim, exceeded.
    */
  def noiseMonitoring(events: DataFrame, zones: DataFrame,
                      windowMs: Long = 60000L): DataFrame = {
    val inNb = inZonesOfKind(events, zones, "neighbourhood")
      .select("ts_ms", "zone_id", "noise_db", "lim")
    Windows.tumbling(inNb, "ts_ms", windowMs, Seq("zone_id"),
        Seq(count(lit(1)).as("n_events"), avg("noise_db").as("avg_db"),
          max("noise_db").as("max_db"), max("lim").as("lim")))
      .withColumn("exceeded", col("avg_db") > col("lim"))
  }

  /** Q3 — Dynamic Speed Limit: emit a violation row for every event
    * inside a curve/high-risk zone travelling above the zone's limit.
    *
    * Output: id, train, ts_ms, lon, lat, zone_id, speed_kmh, suggested_kmh.
    */
  def dynamicSpeedLimit(events: DataFrame, zones: DataFrame): DataFrame = {
    inZonesOfKind(events, zones, "curve")
      .where(col("speed_kmh") > col("lim"))
      .select(col("id"), col("train"), col("ts_ms"), col("lon"), col("lat"),
        col("zone_id"), col("speed_kmh"), col("lim").as("suggested_kmh"))
  }

  /** Q4 — Weather-Based Speed Zones: join each event to the weather
    * condition of its grid cell for its hour; suggest a condition- and
    * severity-dependent limit and emit events exceeding it.
    *
    * Output: id, train, ts_ms, condition, severity, speed_kmh, suggested_kmh.
    */
  def weatherSpeedZones(events: DataFrame, weather: DataFrame): DataFrame = {
    val ev = events
      .withColumn("cell_x",
        floor((col("lon") - RailNetwork.LonMin) / RailNetwork.CellLon).cast("int"))
      .withColumn("cell_y",
        floor((col("lat") - RailNetwork.LatMin) / RailNetwork.CellLat).cast("int"))
      .withColumn("hour_ms",
        lit(TrainData.T0) +
          floor((col("ts_ms") - TrainData.T0) / 3600000L) * 3600000L)
    val base = when(col("condition") === 0, 130.0)
      .when(col("condition") === 1, 100.0)
      .when(col("condition") === 3, 80.0)
      .otherwise(60.0)
    ev.join(weather, Seq("cell_x", "cell_y", "hour_ms"))
      .withColumn("suggested_kmh", base * (lit(1.0) - col("severity") * 0.3))
      .where(col("speed_kmh") > col("suggested_kmh"))
      .select("id", "train", "ts_ms", "condition", "severity",
        "speed_kmh", "suggested_kmh")
  }
}
