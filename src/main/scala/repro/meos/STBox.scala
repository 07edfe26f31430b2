package repro.meos

/** A spatiotemporal bounding box, MEOS's `STBox` type.
  *
  * Spatial extent is an axis-aligned rectangle in lon/lat degrees;
  * the temporal extent is an epoch-millisecond interval. Either
  * dimension may be unbounded (use the `spatial` / full constructors).
  * Intervals are closed on both ends, matching MEOS's default
  * inclusive bounds for boxes.
  */
final case class STBox(
    xmin: Double, xmax: Double,
    ymin: Double, ymax: Double,
    tmin: Long, tmax: Long) {
  require(xmin <= xmax && ymin <= ymax && tmin <= tmax, s"degenerate STBox: $this")

  /** True iff the spatial rectangle contains (lon, lat). */
  def containsXY(lon: Double, lat: Double): Boolean =
    lon >= xmin && lon <= xmax && lat >= ymin && lat <= ymax

  /** True iff `t` lies in the temporal extent. */
  def containsT(t: Long): Boolean = t >= tmin && t <= tmax

  /** True iff the spatiotemporal point (lon, lat, t) is in the box. */
  def contains(lon: Double, lat: Double, t: Long): Boolean =
    containsXY(lon, lat) && containsT(t)

  /** True iff the two boxes overlap in all three dimensions. */
  def intersects(o: STBox): Boolean =
    xmin <= o.xmax && o.xmin <= xmax &&
      ymin <= o.ymax && o.ymin <= ymax &&
      tmin <= o.tmax && o.tmin <= tmax

  /** Smallest box covering both, MEOS's box union. */
  def union(o: STBox): STBox = STBox(
    math.min(xmin, o.xmin), math.max(xmax, o.xmax),
    math.min(ymin, o.ymin), math.max(ymax, o.ymax),
    math.min(tmin, o.tmin), math.max(tmax, o.tmax))

  /** Box grown by `meters` on each spatial side (temporal unchanged). */
  def expandMeters(meters: Double): STBox = STBox(
    xmin - meters / Geo.MetersPerDegLon, xmax + meters / Geo.MetersPerDegLon,
    ymin - meters / Geo.MetersPerDegLat, ymax + meters / Geo.MetersPerDegLat,
    tmin, tmax)
}

object STBox {
  /** A purely spatial box (temporal extent = all of time). */
  def spatial(xmin: Double, xmax: Double, ymin: Double, ymax: Double): STBox =
    STBox(xmin, xmax, ymin, ymax, Long.MinValue, Long.MaxValue)

  /** Bounding box of a set of (lon, lat, t) triples. */
  def ofPoints(pts: Iterable[(Double, Double, Long)]): STBox = {
    require(pts.nonEmpty, "STBox.ofPoints: empty input")
    var x0 = Double.MaxValue; var x1 = Double.MinValue
    var y0 = Double.MaxValue; var y1 = Double.MinValue
    var t0 = Long.MaxValue; var t1 = Long.MinValue
    pts.foreach { case (x, y, t) =>
      if (x < x0) x0 = x; if (x > x1) x1 = x
      if (y < y0) y0 = y; if (y > y1) y1 = y
      if (t < t0) t0 = t; if (t > t1) t1 = t
    }
    STBox(x0, x1, y0, y1, t0, t1)
  }
}
