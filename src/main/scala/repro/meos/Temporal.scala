package repro.meos

/** A temporal point instant: position (lon, lat) at epoch-ms `t`. */
final case class TInst(t: Long, lon: Double, lat: Double)

/** A temporal point sequence (MEOS `tgeompoint` sequence, linear
  * interpolation): instants strictly increasing in time, with the
  * position between instants interpolated linearly.
  */
final case class TSeq(insts: IndexedSeq[TInst]) {
  require(insts.nonEmpty, "TSeq must have at least one instant")
  require(insts.sliding(2).forall(p => p.length < 2 || p(0).t < p(1).t),
    "TSeq instants must be strictly increasing in time")

  def startT: Long = insts.head.t
  def endT: Long = insts.last.t

  /** Duration covered by the sequence, in milliseconds. */
  def durationMs: Long = endT - startT

  /** Path length in meters (sum of straight segments). */
  def lengthMeters: Double =
    insts.iterator.sliding(2).withPartial(false).map { p =>
      Geo.distMeters(p(0).lon, p(0).lat, p(1).lon, p(1).lat)
    }.sum

  /** Time-weighted average speed in m/s; 0 for an instantaneous sequence. */
  def avgSpeedMps: Double =
    if (durationMs <= 0L) 0.0 else lengthMeters / (durationMs / 1000.0)

  /** Interpolated position at time `t` (must lie within [startT, endT]). */
  def interp(t: Long): (Double, Double) = {
    require(t >= startT && t <= endT, s"t=$t outside [$startT, $endT]")
    val i = insts.lastIndexWhere(_.t <= t)
    val a = insts(i)
    if (a.t == t || i == insts.length - 1) (a.lon, a.lat)
    else {
      val b = insts(i + 1)
      val u = (t - a.t).toDouble / (b.t - a.t)
      (a.lon + u * (b.lon - a.lon), a.lat + u * (b.lat - a.lat))
    }
  }

  /** MEOS `edwithin(tpoint, geo, d)`: does the moving point *ever* come
    * within `d` meters of the fixed point? Exact over the linear
    * segments (min point-segment distance).
    */
  def everDWithin(lon: Double, lat: Double, d: Double): Boolean =
    minDistMeters(lon, lat) <= d

  /** Minimum distance in meters from the trajectory to a fixed point. */
  def minDistMeters(lon: Double, lat: Double): Double =
    if (insts.length == 1) Geo.distMeters(lon, lat, insts.head.lon, insts.head.lat)
    else insts.iterator.sliding(2).withPartial(false).map { p =>
      Geo.pointSegmentDistMeters(lon, lat, p(0).lon, p(0).lat, p(1).lon, p(1).lat)
    }.min

  /** MEOS `tpoint_at_stbox`: the restriction of the sequence to a
    * spatiotemporal box, as the list of maximal sub-sequences inside it.
    *
    * For linear motion through an axis-aligned box, "inside" is a
    * conjunction of linear inequalities in the segment parameter, so
    * each segment contributes an exact closed interval; boundary
    * crossings are interpolated instants (timestamps rounded to ms).
    */
  def atStbox(box: STBox): Seq[TSeq] = {
    if (insts.length == 1) {
      val i = insts.head
      return if (box.contains(i.lon, i.lat, i.t)) Seq(this) else Seq.empty
    }
    // Collect inside-intervals [t0, t1] per segment, then merge.
    val raw = insts.iterator.sliding(2).withPartial(false).flatMap { p =>
      segmentInBox(p(0), p(1), box)
    }.toList
    if (raw.isEmpty) return Seq.empty
    val merged = raw.sortBy(_._1).foldLeft(List.empty[(Long, Long)]) {
      case (acc @ ((s, e) :: rest), (s2, e2)) =>
        if (s2 <= e) (s, math.max(e, e2)) :: rest else (s2, e2) :: acc
      case (Nil, iv) => iv :: Nil
    }.reverse
    merged.map { case (t0, t1) =>
      val inner = insts.filter(i => i.t > t0 && i.t < t1)
      val (lon0, lat0) = interp(t0)
      val (lon1, lat1) = interp(t1)
      val head = TInst(t0, lon0, lat0)
      val last = TInst(t1, lon1, lat1)
      val all = (head +: inner) ++ (if (t1 > t0) Seq(last) else Seq.empty)
      TSeq(all)
    }
  }

  /** True iff any part of the sequence lies inside the box. */
  def everAtStbox(box: STBox): Boolean = atStbox(box).nonEmpty

  /** Inside-interval (epoch ms) of the segment a->b w.r.t. `box`, if any. */
  private def segmentInBox(a: TInst, b: TInst, box: STBox): Option[(Long, Long)] = {
    // Parameter u in [0,1]; clip u-range by each of the 6 half-spaces.
    var u0 = 0.0; var u1 = 1.0
    def clip(p: Double, q: Double): Boolean = {
      // constraint p*u <= q
      if (p == 0.0) q >= 0.0
      else if (p > 0.0) { u1 = math.min(u1, q / p); u0 <= u1 }
      else { u0 = math.max(u0, q / p); u0 <= u1 }
    }
    val dx = b.lon - a.lon; val dy = b.lat - a.lat
    val ok =
      clip(-dx, a.lon - box.xmin) && clip(dx, box.xmax - a.lon) &&
        clip(-dy, a.lat - box.ymin) && clip(dy, box.ymax - a.lat)
    if (!ok) return None
    val dt = (b.t - a.t).toDouble
    val t0 = math.max(a.t + u0 * dt, box.tmin.toDouble)
    val t1 = math.min(a.t + u1 * dt, box.tmax.toDouble)
    if (t0 > t1) None else Some((math.round(t0), math.round(t1)))
  }
}

object TSeq {
  /** Build from unsorted (t, lon, lat) triples, dropping duplicate
    * timestamps (keeping the first observation, as MEOS's `make`
    * constructors do with duplicate instants).
    */
  def of(points: Iterable[(Long, Double, Double)]): TSeq = {
    val sorted = points.toIndexedSeq.sortBy(_._1)
    val dedup = sorted.foldLeft(Vector.empty[TInst]) { (acc, p) =>
      if (acc.nonEmpty && acc.last.t == p._1) acc else acc :+ TInst(p._1, p._2, p._3)
    }
    TSeq(dedup)
  }
}
