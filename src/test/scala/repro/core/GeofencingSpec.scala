package repro.core

import org.apache.spark.sql.functions._

import repro.{Oracle, OracleSql, RowCompare, SparkSpec, TestData}
import repro.meos.Geo
import repro.sncb.{RailNetwork, TrainData}

/** Q1–Q4 against the DuckDB oracle (rectangles → plain arithmetic) and
  * against the naive baselines (which must return identical rows).
  */
class GeofencingSpec extends SparkSpec {

  private lazy val ev = TestData.events002
  private lazy val zones = TestData.zones
  private lazy val weather = TestData.weather

  // ---------------------------------------------------------- Q1 ----

  private lazy val q1 = Geofencing.alertFiltering(ev, zones).cache()

  test("Q1 matches the DuckDB oracle") {
    Oracle.assertEquivalent(q1,
      s"""WITH e AS (${OracleSql.E}), z AS (${OracleSql.Z}),
         |a AS (SELECT id, train, ts_ms, lon, lat, alert_type FROM e
         |      WHERE alert_type IS NOT NULL),
         |inm AS (SELECT DISTINCT a.id FROM a JOIN z
         |        ON z.kind = 'maintenance' AND ${OracleSql.inZone("a.lon", "a.lat")})
         |SELECT a.id, a.train, a.ts_ms, a.lon, a.lat, a.alert_type,
         |       (a.id IN (SELECT id FROM inm)) AS in_maintenance
         |FROM a
         |WHERE NOT (a.id IN (SELECT id FROM inm) AND a.alert_type = 'SPEED')""".stripMargin,
      "events" -> ev, "zones" -> zones)
  }

  test("Q1 equals the naive cross-join baseline") {
    RowCompare.assertSameRows(q1, Baselines.alertFiltering(ev, zones))
  }

  test("Q1 emits alerts and drops at least one in-maintenance SPEED alert") {
    // SF=0.01 so a SPEED alert provably falls inside a maintenance zone.
    val ev01 = TestData.events01
    val out = Geofencing.alertFiltering(ev01, zones)
    val alerts = ev01.where(col("alert_type").isNotNull)
    val mz = zones.where(col("kind") === "maintenance")
    val speedInMaint = alerts.where(col("alert_type") === "SPEED")
      .join(mz, expr("st_in_box(lon, lat, xmin, xmax, ymin, ymax)"), "left_semi")
      .count()
    assert(speedInMaint > 0, "generator planted no in-maintenance SPEED alert at SF=0.01")
    assert(out.count() == alerts.count() - speedInMaint)
  }

  test("Q1 never emits a SPEED alert flagged in_maintenance") {
    assert(q1.where(col("in_maintenance") && col("alert_type") === "SPEED").count() == 0)
  }

  test("Q1 keeps EQUIP (essential) alerts inside maintenance zones") {
    // Every EQUIP alert of the input survives.
    val equipIn = ev.where(col("alert_type") === "EQUIP").count()
    assert(q1.where(col("alert_type") === "EQUIP").count() == equipIn)
  }

  // ---------------------------------------------------------- Q2 ----

  private lazy val q2 = Geofencing.noiseMonitoring(ev, zones).cache()

  test("Q2 matches the DuckDB oracle") {
    Oracle.assertEquivalent(q2,
      s"""WITH e AS (${OracleSql.E}), z AS (${OracleSql.Z}),
         |nb AS (SELECT e.ts_ms, z.zone_id, e.noise_db, z.lim FROM e JOIN z
         |       ON z.kind = 'neighbourhood' AND ${OracleSql.inZone("e.lon", "e.lat")})
         |SELECT (ts_ms // 60000) * 60000 AS win_start, zone_id,
         |       COUNT(*) AS n_events, AVG(noise_db) AS avg_db,
         |       MAX(noise_db) AS max_db, MAX(lim) AS lim,
         |       AVG(noise_db) > MAX(lim) AS exceeded
         |FROM nb GROUP BY 1, 2""".stripMargin,
      "events" -> ev, "zones" -> zones)
  }

  test("Q2 equals the naive baseline") {
    RowCompare.assertSameRows(q2, Baselines.noiseMonitoring(ev, zones))
  }

  test("Q2 produces windows and some exceed the ceiling") {
    assert(q2.count() > 0)
    assert(q2.where(col("exceeded")).count() > 0, "no window exceeded its dB ceiling")
    assert(q2.where(!col("exceeded")).count() > 0, "every window exceeded — not discriminating")
  }

  test("Q2 window starts are aligned to the window size") {
    assert(q2.where(col("win_start") % 60000L =!= 0).count() == 0)
  }

  // ---------------------------------------------------------- Q3 ----

  private lazy val q3 = Geofencing.dynamicSpeedLimit(ev, zones).cache()

  test("Q3 matches the DuckDB oracle") {
    Oracle.assertEquivalent(q3,
      s"""WITH e AS (${OracleSql.E}), z AS (${OracleSql.Z})
         |SELECT e.id, e.train, e.ts_ms, e.lon, e.lat, z.zone_id,
         |       e.speed_kmh, z.lim AS suggested_kmh
         |FROM e JOIN z ON z.kind = 'curve'
         |  AND ${OracleSql.inZone("e.lon", "e.lat")}
         |  AND e.speed_kmh > z.lim""".stripMargin,
      "events" -> ev, "zones" -> zones)
  }

  test("Q3 equals the naive baseline") {
    RowCompare.assertSameRows(q3, Baselines.dynamicSpeedLimit(ev, zones))
  }

  test("Q3 reports only true violations") {
    assert(TestData.events01.count() > 0)
    val v = Geofencing.dynamicSpeedLimit(TestData.events01, zones)
    assert(v.count() > 0, "no violations found at SF=0.01")
    assert(v.where(col("speed_kmh") <= col("suggested_kmh")).count() == 0)
  }

  test("Q3 violations lie inside their curve zone") {
    val withZone = q3.join(
      zones.select(col("zone_id"), col("xmin"), col("xmax"), col("ymin"), col("ymax")),
      Seq("zone_id"))
    assert(withZone.where(
      !expr("st_in_box(lon, lat, xmin, xmax, ymin, ymax)")).count() == 0)
  }

  // ---------------------------------------------------------- Q4 ----

  private lazy val q4 = Geofencing.weatherSpeedZones(ev, weather).cache()

  test("Q4 matches the DuckDB oracle") {
    Oracle.assertEquivalent(q4,
      s"""WITH e AS (${OracleSql.E}), w AS (${OracleSql.W}),
         |e2 AS (SELECT *,
         |  CAST(floor((lon - ${RailNetwork.LonMin}) / ${RailNetwork.CellLon}) AS INT) AS cell_x,
         |  CAST(floor((lat - ${RailNetwork.LatMin}) / ${RailNetwork.CellLat}) AS INT) AS cell_y,
         |  (ts_ms - ${TrainData.T0}) // 3600000 * 3600000 + ${TrainData.T0} AS hour_ms
         |  FROM e)
         |SELECT e2.id, e2.train, e2.ts_ms, w.condition, w.severity, e2.speed_kmh,
         |       (CASE w.condition WHEN 0 THEN 130.0 WHEN 1 THEN 100.0
         |                         WHEN 3 THEN 80.0 ELSE 60.0 END)
         |         * (1.0 - w.severity * 0.3) AS suggested_kmh
         |FROM e2 JOIN w ON e2.cell_x = w.cell_x AND e2.cell_y = w.cell_y
         |              AND e2.hour_ms = w.hour_ms
         |WHERE e2.speed_kmh >
         |      (CASE w.condition WHEN 0 THEN 130.0 WHEN 1 THEN 100.0
         |                        WHEN 3 THEN 80.0 ELSE 60.0 END)
         |        * (1.0 - w.severity * 0.3)""".stripMargin,
      "events" -> ev, "weather" -> weather)
  }

  test("Q4 flags violations under degraded weather only when speed exceeds the cap") {
    assert(q4.count() > 0, "no weather violations at SF=0.002")
    assert(q4.where(col("speed_kmh") <= col("suggested_kmh")).count() == 0)
  }

  test("Q4 snow caps are the strictest") {
    val bySnow = q4.where(col("condition") === 2)
    assert(bySnow.where(col("suggested_kmh") > 60.0).count() == 0)
  }

  // ------------------------------------------------- bbox prefilter --

  test("bbox prefilter never removes an event inside some zone") {
    val curves = zones.where(col("kind") === "curve")
    val pre = Geofencing.bboxPrefilter(ev, curves)
    val direct = ev.join(curves, expr("st_in_box(lon, lat, xmin, xmax, ymin, ymax)"))
      .select("id").distinct()
    val lost = direct.join(pre.select("id"), Seq("id"), "left_anti").count()
    assert(lost == 0)
  }

  test("bbox prefilter actually prunes at SF=0.002") {
    val mz = zones.where(col("kind") === "maintenance")
    val kept = Geofencing.bboxPrefilter(ev, mz).count()
    assert(kept < ev.count(), "prefilter kept everything — no pruning")
  }
}
