package repro

/** DuckDB-side CTE snippets for the oracle: the [[Oracle]] loads every
  * table as VARCHAR columns, so each reference query starts by casting
  * back to typed columns. Keep these in lock-step with the generator
  * schemas in [[repro.sncb.TrainData]] / [[repro.sncb.RailNetwork]].
  */
object OracleSql {

  /** Typed view over the `events` table. */
  val E: String =
    """SELECT CAST(id AS BIGINT) AS id, CAST(train AS INT) AS train,
      |       CAST(seq AS BIGINT) AS seq, CAST(ts_ms AS BIGINT) AS ts_ms,
      |       CAST(lon AS DOUBLE) AS lon, CAST(lat AS DOUBLE) AS lat,
      |       CAST(speed_kmh AS DOUBLE) AS speed_kmh,
      |       CAST(battery_v AS DOUBLE) AS battery_v,
      |       CAST(temp_c AS DOUBLE) AS temp_c,
      |       CAST(brake_bar AS DOUBLE) AS brake_bar,
      |       CAST(noise_db AS DOUBLE) AS noise_db,
      |       CAST(passengers AS INT) AS passengers,
      |       alert_type
      |FROM events""".stripMargin

  /** Typed view over the `zones` table. */
  val Z: String =
    """SELECT CAST(zone_id AS INT) AS zone_id, kind,
      |       CAST(xmin AS DOUBLE) AS xmin, CAST(xmax AS DOUBLE) AS xmax,
      |       CAST(ymin AS DOUBLE) AS ymin, CAST(ymax AS DOUBLE) AS ymax,
      |       CAST(lim AS DOUBLE) AS lim
      |FROM zones""".stripMargin

  /** Typed view over the `weather` table. */
  val W: String =
    """SELECT CAST(cell_x AS INT) AS cell_x, CAST(cell_y AS INT) AS cell_y,
      |       CAST(hour_ms AS BIGINT) AS hour_ms,
      |       CAST(condition AS INT) AS condition,
      |       CAST(severity AS DOUBLE) AS severity
      |FROM weather""".stripMargin

  /** Rectangle containment predicate (closed bounds, matching
    * `st_in_box`), for a point (`lonC`, `latC`) against zone row `z`.
    */
  def inZone(lonC: String, latC: String, z: String = "z"): String =
    s"$lonC >= $z.xmin AND $lonC <= $z.xmax AND $latC >= $z.ymin AND $latC <= $z.ymax"
}
