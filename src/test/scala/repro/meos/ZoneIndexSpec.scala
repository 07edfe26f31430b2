package repro.meos

import org.apache.spark.sql.functions._

import repro.{SparkSpec, TestData}
import repro.core.NebulaMeos
import repro.sncb.RailNetwork

class ZoneIndexSpec extends SparkSpec {

  override def beforeAll(): Unit = { super.beforeAll(); NebulaMeos.setup(spark) }

  test("cellId is consistent with cellIdCol") {
    import spark.implicits._
    val pts = Seq((4.123, 50.789), (4.0, 50.5), (4.899, 51.099)).toDF("lon", "lat")
    val got = pts.select(ZoneIndex.cellIdCol).collect().map(_.getLong(0)).toSeq
    val exp = Seq((4.123, 50.789), (4.0, 50.5), (4.899, 51.099))
      .map(p => ZoneIndex.cellId(p._1, p._2))
    assert(got == exp)
  }

  test("cellsOf covers every point of the zone") {
    RailNetwork.all.foreach { z =>
      val cells = ZoneIndex.cellsOf(z).toSet
      // Sample a grid of points inside the zone; each must map to a cell
      // in the zone's cell list.
      for (i <- 0 to 4; j <- 0 to 4) {
        val lon = z.xmin + (z.xmax - z.xmin) * i / 4.0
        val lat = z.ymin + (z.ymax - z.ymin) * j / 4.0
        assert(cells.contains(ZoneIndex.cellId(lon, lat)),
          s"zone ${z.zoneId}: ($lon, $lat) outside its cell cover")
      }
    }
  }

  test("cellsOf is minimal-ish: no more cells than the rectangle spans") {
    RailNetwork.all.foreach { z =>
      val nx = ((z.xmax - z.xmin) / ZoneIndex.CellLon).toInt + 2
      val ny = ((z.ymax - z.ymin) / ZoneIndex.CellLat).toInt + 2
      assert(ZoneIndex.cellsOf(z).size <= nx * ny)
    }
  }

  test("indexDf has one row per (cell, zone)") {
    val zones = RailNetwork.all
    val df = ZoneIndex.indexDf(spark, zones)
    assert(df.count() == zones.map(z => ZoneIndex.cellsOf(z).size.toLong).sum)
    assert(df.select("cell_id", "zone_id").distinct().count() == df.count())
  }

  test("indexed join equals the direct containment join (base catalogue)") {
    val ev = TestData.events002
    val zones = RailNetwork.all
    val idx = ZoneIndex.indexDf(spark, zones)
    val viaIndex = ZoneIndex.join(ev, idx)
      .select("id", "zone_id")
    val direct = ev.join(RailNetwork.toDf(spark, zones),
        expr("st_in_box(lon, lat, xmin, xmax, ymin, ymax)"))
      .select("id", "zone_id")
    assert(viaIndex.count() == direct.count())
    assert(viaIndex.except(direct).count() == 0)
    assert(direct.except(viaIndex).count() == 0)
  }

  test("indexed join equals the direct join on the enlarged catalogue") {
    val ev = TestData.events002.limit(2000)
    val zones = RailNetwork.syntheticZones(200)
    val idx = ZoneIndex.indexDf(spark, zones)
    val viaIndex = ZoneIndex.join(ev, idx).select("id", "zone_id")
    val direct = ev.join(RailNetwork.toDf(spark, zones),
        expr("st_in_box(lon, lat, xmin, xmax, ymin, ymax)"))
      .select("id", "zone_id")
    assert(viaIndex.except(direct).count() == 0)
    assert(direct.except(viaIndex).count() == 0)
  }

  test("syntheticZones is deterministic and well-formed") {
    val a = RailNetwork.syntheticZones(100)
    val b = RailNetwork.syntheticZones(100)
    assert(a == b)
    assert(a.map(_.zoneId).distinct.size == 100)
    assert(a.forall(z => z.xmin < z.xmax && z.ymin < z.ymax))
    val kinds = a.map(_.kind).toSet
    assert(kinds == Set("maintenance", "curve", "neighbourhood"))
  }

  test("synthetic zones are actually visited by the trains") {
    val ev = TestData.events01
    val idx = ZoneIndex.indexDf(spark, RailNetwork.syntheticZones(100))
    assert(ZoneIndex.join(ev, idx).count() > 0)
  }
}
