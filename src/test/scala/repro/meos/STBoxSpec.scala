package repro.meos

import org.scalacheck.{Gen, Prop, Test => SCTest}

import repro.SparkSpec

class STBoxSpec extends SparkSpec {

  private val box = STBox(4.0, 5.0, 50.0, 51.0, 1000L, 2000L)

  private def check(p: Prop): Unit = {
    val r = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(200), p)
    assert(r.passed, r.status.toString)
  }

  test("degenerate boxes are rejected") {
    intercept[IllegalArgumentException](STBox(5.0, 4.0, 50.0, 51.0, 0L, 1L))
    intercept[IllegalArgumentException](STBox(4.0, 5.0, 51.0, 50.0, 0L, 1L))
    intercept[IllegalArgumentException](STBox(4.0, 5.0, 50.0, 51.0, 2L, 1L))
  }

  test("contains: interior, boundary, exterior") {
    assert(box.contains(4.5, 50.5, 1500L))
    assert(box.contains(4.0, 50.0, 1000L), "closed lower bounds")
    assert(box.contains(5.0, 51.0, 2000L), "closed upper bounds")
    assert(!box.contains(3.9, 50.5, 1500L))
    assert(!box.contains(4.5, 51.1, 1500L))
    assert(!box.contains(4.5, 50.5, 999L))
    assert(!box.contains(4.5, 50.5, 2001L))
  }

  test("containsXY ignores time; containsT ignores space") {
    assert(box.containsXY(4.5, 50.5))
    assert(!box.containsXY(5.5, 50.5))
    assert(box.containsT(1000L) && !box.containsT(2001L))
  }

  test("spatial box contains any time") {
    val s = STBox.spatial(4.0, 5.0, 50.0, 51.0)
    assert(s.contains(4.5, 50.5, Long.MinValue))
    assert(s.contains(4.5, 50.5, Long.MaxValue))
  }

  test("intersects: overlapping, touching, disjoint") {
    assert(box.intersects(STBox(4.5, 5.5, 50.5, 51.5, 1500L, 2500L)))
    assert(box.intersects(STBox(5.0, 6.0, 51.0, 52.0, 2000L, 3000L)), "touching counts")
    assert(!box.intersects(STBox(5.1, 6.0, 50.0, 51.0, 1000L, 2000L)))
    assert(!box.intersects(STBox(4.0, 5.0, 50.0, 51.0, 2001L, 3000L)), "disjoint in time only")
  }

  test("intersects is symmetric") {
    val gb = for {
      x0 <- Gen.choose(0.0, 10.0); dx <- Gen.choose(0.0, 5.0)
      y0 <- Gen.choose(0.0, 10.0); dy <- Gen.choose(0.0, 5.0)
      t0 <- Gen.choose(0L, 1000L); dt <- Gen.choose(0L, 500L)
    } yield STBox(x0, x0 + dx, y0, y0 + dy, t0, t0 + dt)
    check(Prop.forAll(gb, gb)((a, b) => a.intersects(b) == b.intersects(a)))
  }

  test("union covers both inputs") {
    val o = STBox(6.0, 7.0, 49.0, 50.5, 0L, 500L)
    val u = box.union(o)
    assert(u.xmin == 4.0 && u.xmax == 7.0 && u.ymin == 49.0 && u.ymax == 51.0)
    assert(u.tmin == 0L && u.tmax == 2000L)
    assert(u.intersects(box) && u.intersects(o))
  }

  test("expandMeters grows each side by the requested distance") {
    val e = box.expandMeters(1000.0)
    assert(math.abs((box.xmin - e.xmin) * Geo.MetersPerDegLon - 1000.0) < 1e-6)
    assert(math.abs((e.ymax - box.ymax) * Geo.MetersPerDegLat - 1000.0) < 1e-6)
    assert(e.tmin == box.tmin && e.tmax == box.tmax)
  }

  test("ofPoints is the tight bounding box") {
    val b = STBox.ofPoints(Seq((4.2, 50.3, 5L), (4.8, 50.1, 9L), (4.5, 50.9, 1L)))
    assert(b == STBox(4.2, 4.8, 50.1, 50.9, 1L, 9L))
  }

  test("ofPoints of a single point is a degenerate-but-valid box") {
    val b = STBox.ofPoints(Seq((4.2, 50.3, 5L)))
    assert(b.contains(4.2, 50.3, 5L))
    assert(!b.contains(4.2001, 50.3, 5L))
  }

  test("ofPoints rejects empty input") {
    intercept[IllegalArgumentException](STBox.ofPoints(Seq.empty))
  }

  test("every generating point is contained in ofPoints") {
    val gp = Gen.zip(Gen.choose(4.0, 5.0), Gen.choose(50.0, 51.0), Gen.choose(0L, 1000L))
    check(Prop.forAll(Gen.nonEmptyListOf(gp)) { pts =>
      val b = STBox.ofPoints(pts)
      pts.forall(p => b.contains(p._1, p._2, p._3))
    })
  }
}
