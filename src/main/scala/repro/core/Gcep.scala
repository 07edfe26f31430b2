package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.sncb.{RailNetwork, TrainData}
import repro.stream.{Cep, ThresholdWindow, Windows}

/** Geospatial complex event processing queries Q5–Q8 (paper §3.2). */
object Gcep {

  /** Q5 — Battery Monitoring: per train and tumbling window, compare
    * battery voltage against the predefined charge/discharge curve;
    * alert on average deviation or overheating and attach the nearest
    * workshop (MEOS `st_distance` + `min_by`).
    *
    * Output: win_start, train, n_events, avg_dev, max_temp, alert_kind,
    *         workshop_id, workshop_dist_m.
    */
  def batteryMonitoring(events: DataFrame, zones: DataFrame,
                        windowMs: Long = 300000L,
                        devThreshold: Double = 1.5,
                        tempThreshold: Double = 35.0): DataFrame = {
    val dev = events.withColumn("dev",
      abs(col("battery_v") - TrainData.expectedBatteryV(col("seq"))))
    val win = Windows.tumbling(dev, "ts_ms", windowMs, Seq("train"),
      Seq(count(lit(1)).as("n_events"), avg("dev").as("avg_dev"),
        max("dev").as("max_dev"), max("temp_c").as("max_temp"),
        avg("lon").as("c_lon"), avg("lat").as("c_lat")))
    val alerts = win
      .where(col("max_dev") > devThreshold || col("max_temp") > tempThreshold)
      .withColumn("alert_kind",
        when(col("max_dev") > devThreshold && col("max_temp") > tempThreshold, "BOTH")
          .when(col("max_dev") > devThreshold, "BATTERY")
          .otherwise("OVERHEAT"))
    val ws = zones.where(col("kind") === "workshop")
      .select(col("zone_id").as("w_id"),
        ((col("xmin") + col("xmax")) / 2).as("w_lon"),
        ((col("ymin") + col("ymax")) / 2).as("w_lat"))
    alerts.crossJoin(ws)
      .withColumn("w_dist", expr("st_distance(c_lon, c_lat, w_lon, w_lat)"))
      .groupBy("win_start", "train", "n_events", "avg_dev", "max_dev",
        "max_temp", "alert_kind")
      .agg(expr("min_by(w_id, w_dist)").as("workshop_id"),
        min("w_dist").as("workshop_dist_m"))
  }

  /** Q6 — Heavy Passenger Load: per train and tumbling window, flag
    * windows with average occupancy at or above capacity (no free
    * seats) so an extra train can be scheduled.
    *
    * Output: win_start, train, n_events, avg_pax, max_pax, occupancy.
    */
  def heavyPassengerLoad(events: DataFrame,
                         windowMs: Long = 600000L,
                         capacity: Int = TrainData.Capacity): DataFrame =
    Windows.tumbling(events, "ts_ms", windowMs, Seq("train"),
        Seq(count(lit(1)).as("n_events"), avg("passengers").as("avg_pax"),
          max("passengers").as("max_pax")))
      .withColumn("occupancy", col("avg_pax") / capacity)
      .where(col("occupancy") >= 1.0)

  /** Q7 — Unscheduled Stops: threshold windows where speed < 1 km/h for
    * at least `minDurMs`, whose centroid lies outside every designated
    * (station or workshop) zone.
    *
    * Output: train, startMs, endMs, n, cLon, cLat.
    */
  def unscheduledStops(events: DataFrame, zones: DataFrame,
                       minDurMs: Long = 60000L): DataFrame = {
    val prepared = events.select(col("train").cast("long").as("key"),
      col("ts_ms").as("tsMs"), col("speed_kmh").as("value"),
      col("lon"), col("lat"))
    val stops = ThresholdWindow.batch(prepared, col("value") < 1.0, minDurMs)
    val designated = zones.where(col("kind").isin("station", "workshop"))
    stops
      .join(designated,
        expr("st_in_box(cLon, cLat, xmin, xmax, ymin, ymax)"), "left_anti")
      .select(col("key").as("train"), col("startMs"), col("endMs"),
        col("n"), col("cLon"), col("cLat"))
  }

  /** Track segment id of a position: cell of a fixed 0.02° x 0.015°
    * grid over the network frame (≈ 1.4 x 1.7 km segments).
    */
  def segmentCol = (floor((col("lon") - RailNetwork.LonMin) / 0.02) * 1000 +
    floor((col("lat") - RailNetwork.LatMin) / 0.015)).cast("long").as("segment")

  /** Q8a — Monitoring Brakes (pattern): at least `k` emergency-brake
    * events (< 2 bar) in one sliding window over the same track
    * segment.
    *
    * Output: win_start, segment, n_events, first_ms, last_ms.
    */
  def brakePatterns(events: DataFrame,
                    sizeMs: Long = 600000L, slideMs: Long = 120000L,
                    k: Long = 3L): DataFrame =
    Cep.countPattern(events.withColumn("segment", segmentCol),
      Seq("segment"), "ts_ms", col("brake_bar") < 2.0, sizeMs, slideMs, k)

  /** Q8b — Monitoring Brakes (persistent low pressure): threshold
    * windows where brake pressure stays below 4 bar for `minDurMs`.
    *
    * Output: train, startMs, endMs, n, avgValue (mean bar), cLon, cLat.
    */
  def persistentLowPressure(events: DataFrame,
                            minDurMs: Long = 240000L): DataFrame =
    ThresholdWindow.batch(
        events.select(col("train").cast("long").as("key"),
          col("ts_ms").as("tsMs"), col("brake_bar").as("value"),
          col("lon"), col("lat")),
        col("value") < 4.0, minDurMs)
      .select(col("key").as("train"), col("startMs"), col("endMs"),
        col("n"), col("avgValue"), col("cLon"), col("cLat"))
}
