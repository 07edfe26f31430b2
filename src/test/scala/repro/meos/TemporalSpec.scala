package repro.meos

import org.scalacheck.{Gen, Prop, Test => SCTest}

import repro.SparkSpec

class TemporalSpec extends SparkSpec {

  // Straight eastward run: 1 instant per second, 0.001 deg lon per step.
  private val east = TSeq((0 to 10).map(i => TInst(i * 1000L, 4.0 + i * 0.001, 50.8)))

  private def check(p: Prop): Unit = {
    val r = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(100), p)
    assert(r.passed, r.status.toString)
  }

  private val genSeq: Gen[TSeq] = for {
    n <- Gen.choose(2, 20)
    lons <- Gen.listOfN(n, Gen.choose(4.0, 5.0))
    lats <- Gen.listOfN(n, Gen.choose(50.0, 51.0))
  } yield TSeq(lons.zip(lats).zipWithIndex.map {
    case ((lo, la), i) => TInst(i * 1000L, lo, la)
  }.toIndexedSeq)

  test("construction rejects empty and non-increasing sequences") {
    intercept[IllegalArgumentException](TSeq(IndexedSeq.empty))
    intercept[IllegalArgumentException](
      TSeq(IndexedSeq(TInst(5L, 4.0, 50.0), TInst(5L, 4.1, 50.0))))
    intercept[IllegalArgumentException](
      TSeq(IndexedSeq(TInst(5L, 4.0, 50.0), TInst(4L, 4.1, 50.0))))
  }

  test("TSeq.of sorts input and drops duplicate timestamps") {
    val s = TSeq.of(Seq((2000L, 4.2, 50.2), (0L, 4.0, 50.0), (2000L, 9.9, 9.9), (1000L, 4.1, 50.1)))
    assert(s.insts.map(_.t) == IndexedSeq(0L, 1000L, 2000L))
    assert(s.insts(2).lon == 4.2, "first observation wins on duplicate ts")
  }

  test("duration and length of the eastward run") {
    assert(east.durationMs == 10000L)
    assert(math.abs(east.lengthMeters - 0.01 * Geo.MetersPerDegLon) < 1e-6)
  }

  test("avgSpeed = length / duration; zero for instantaneous sequence") {
    assert(math.abs(east.avgSpeedMps - east.lengthMeters / 10.0) < 1e-9)
    assert(TSeq(IndexedSeq(TInst(0L, 4.0, 50.0))).avgSpeedMps == 0.0)
  }

  test("interp at instants returns exact positions") {
    assert(east.interp(0L) == (4.0, 50.8))
    assert(east.interp(10000L) == (4.01, 50.8))
  }

  test("interp between instants is linear") {
    val (lon, lat) = east.interp(1500L)
    assert(math.abs(lon - 4.0015) < 1e-12)
    assert(lat == 50.8)
  }

  test("interp outside the sequence span is rejected") {
    intercept[IllegalArgumentException](east.interp(-1L))
    intercept[IllegalArgumentException](east.interp(10001L))
  }

  test("minDist / everDWithin for a point near the path") {
    // Point 0.001 deg north of the path's midpoint.
    val d = east.minDistMeters(4.005, 50.801)
    assert(math.abs(d - 0.001 * Geo.MetersPerDegLat) < 1e-6)
    assert(east.everDWithin(4.005, 50.801, d + 1.0))
    assert(!east.everDWithin(4.005, 50.801, d - 1.0))
  }

  test("everDWithin on single-instant sequence") {
    val s = TSeq(IndexedSeq(TInst(0L, 4.0, 50.8)))
    assert(s.everDWithin(4.0, 50.8, 0.1))
    assert(!s.everDWithin(4.1, 50.8, 100.0))
  }

  test("minDist is the min over vertex distances or better") {
    check(Prop.forAll(genSeq, Gen.choose(4.0, 5.0), Gen.choose(50.0, 51.0)) {
      (s, lon, lat) =>
        val vertexMin = s.insts.map(i => Geo.distMeters(lon, lat, i.lon, i.lat)).min
        s.minDistMeters(lon, lat) <= vertexMin + 1e-9
    })
  }

  test("atStbox: whole sequence inside box returns the sequence") {
    val box = STBox(3.0, 5.0, 50.0, 51.0, -1L, 20000L)
    val r = east.atStbox(box)
    assert(r == Seq(east))
  }

  test("atStbox: disjoint box returns empty") {
    assert(east.atStbox(STBox(6.0, 7.0, 50.0, 51.0, 0L, 20000L)).isEmpty)
    assert(east.atStbox(STBox(3.0, 5.0, 50.0, 51.0, 20001L, 30000L)).isEmpty)
  }

  test("atStbox: spatial clip interpolates the crossing instant") {
    // Box covering lon >= 4.005 — entered exactly at t = 5000.
    val box = STBox(4.005, 5.0, 50.0, 51.0, Long.MinValue, Long.MaxValue)
    val r = east.atStbox(box)
    assert(r.length == 1)
    assert(r.head.startT == 5000L)
    assert(math.abs(r.head.insts.head.lon - 4.005) < 1e-12)
    assert(r.head.endT == 10000L)
  }

  test("atStbox: temporal clip restricts to the time interval") {
    val box = STBox(3.0, 5.0, 50.0, 51.0, 2500L, 7500L)
    val r = east.atStbox(box)
    assert(r.length == 1)
    assert(r.head.startT == 2500L && r.head.endT == 7500L)
    val (lonAtStart, _) = east.interp(2500L)
    assert(math.abs(r.head.insts.head.lon - lonAtStart) < 1e-12)
  }

  test("atStbox: path crossing the box twice yields two pieces") {
    // Out-and-back in lon: crosses [4.004, 4.006] going east then west.
    val backAndForth = TSeq((0 to 20).map { i =>
      val lon = if (i <= 10) 4.0 + i * 0.001 else 4.0 + (20 - i) * 0.001
      TInst(i * 1000L, lon, 50.8)
    })
    val box = STBox.spatial(4.0045, 4.0065, 50.0, 51.0)
    val r = backAndForth.atStbox(box)
    assert(r.length == 2, s"expected 2 pieces, got ${r.map(p => (p.startT, p.endT))}")
    assert(r(0).endT < r(1).startT)
  }

  test("atStbox: stationary period inside box is preserved") {
    val s = TSeq(IndexedSeq(TInst(0L, 4.0, 50.8), TInst(5000L, 4.0, 50.8),
      TInst(10000L, 4.5, 50.8)))
    val box = STBox.spatial(3.9, 4.1, 50.7, 50.9)
    val r = s.atStbox(box)
    assert(r.length == 1)
    assert(r.head.startT == 0L)
    assert(r.head.endT > 5000L, "leaves the box some time after t=5000")
  }

  test("atStbox pieces always lie inside the box (property)") {
    val genBox = for {
      x0 <- Gen.choose(4.0, 4.8); dx <- Gen.choose(0.05, 1.0)
      y0 <- Gen.choose(50.0, 50.8); dy <- Gen.choose(0.05, 1.0)
      t0 <- Gen.choose(0L, 10000L); dt <- Gen.choose(1000L, 20000L)
    } yield STBox(x0, x0 + dx, y0, y0 + dy, t0, t0 + dt)
    check(Prop.forAll(genSeq, genBox) { (s, box) =>
      // Tolerance: crossing timestamps are rounded to whole ms; at the
      // extreme generated speeds (~1 deg/s) a 0.5 ms shift moves the
      // boundary instant by up to ~80 m along the path.
      val tol = box.expandMeters(100.0)
      s.atStbox(box).forall(piece => piece.insts.forall(i =>
        tol.contains(i.lon, i.lat, i.t)))
    })
  }

  test("atStbox clipped length never exceeds total length (property)") {
    check(Prop.forAll(genSeq) { s =>
      val box = STBox(4.2, 4.7, 50.2, 50.7, 2000L, 15000L)
      s.atStbox(box).map(_.lengthMeters).sum <= s.lengthMeters + 1e-6
    })
  }

  test("everAtStbox consistent with atStbox (property)") {
    check(Prop.forAll(genSeq) { s =>
      val box = STBox(4.3, 4.6, 50.3, 50.6, 0L, 30000L)
      s.everAtStbox(box) == s.atStbox(box).nonEmpty
    })
  }
}
