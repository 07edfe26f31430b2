package repro.stream

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

class CepSpec extends SparkSpec {

  private lazy val brakes = {
    import spark.implicits._
    // Segment 7: a cluster of 4 emergencies within 100 s; segment 8: two
    // emergencies 10 minutes apart (never >= 3 in one window).
    val cluster = Seq(0L, 20000L, 50000L, 90000L).map(t => (7L, t, 1.5))
    val sparse = Seq((8L, 0L, 1.5), (8L, 600000L, 1.5))
    val normal = (0 until 50).map(i => (7L, i * 7000L, 5.0))
    (cluster ++ sparse ++ normal).toDF("segment", "ts_ms", "brake_bar").cache()
  }

  test("countPattern fires on the planted cluster only") {
    val out = Cep.countPattern(brakes, Seq("segment"), "ts_ms",
      col("brake_bar") < 2.0, 600000L, 120000L, 3L)
    val segs = out.select("segment").distinct().collect().map(_.getLong(0)).toSet
    assert(segs == Set(7L))
  }

  test("countPattern respects the threshold k") {
    val out = Cep.countPattern(brakes, Seq("segment"), "ts_ms",
      col("brake_bar") < 2.0, 600000L, 120000L, 5L)
    assert(out.count() == 0)
  }

  test("countPattern carries first/last event times") {
    val r = Cep.countPattern(brakes, Seq("segment"), "ts_ms",
        col("brake_bar") < 2.0, 600000L, 120000L, 4L)
      .orderBy("win_start").limit(1).head()
    assert(r.getAs[Long]("first_ms") == 0L)
    assert(r.getAs[Long]("last_ms") == 90000L)
    assert(r.getAs[Long]("n_events") == 4L)
  }

  test("countPattern matches the DuckDB oracle") {
    val out = Cep.countPattern(brakes, Seq("segment"), "ts_ms",
      col("brake_bar") < 2.0, 600000L, 120000L, 3L)
    Oracle.assertEquivalent(out,
      """WITH t AS (SELECT CAST(segment AS BIGINT) AS segment,
        |                  CAST(ts_ms AS BIGINT) AS ts_ms,
        |                  CAST(brake_bar AS DOUBLE) AS brake_bar FROM brakes),
        |em AS (SELECT * FROM t WHERE brake_bar < 2.0),
        |rep AS (
        |  SELECT segment, ts_ms, (ts_ms // 120000 - off) * 120000 AS win_start
        |  FROM em CROSS JOIN (SELECT unnest(range(0, 5)) AS off)
        |  WHERE ts_ms >= (ts_ms // 120000 - off) * 120000
        |    AND ts_ms <  (ts_ms // 120000 - off) * 120000 + 600000
        |)
        |SELECT win_start, segment, COUNT(*) AS n_events,
        |       MIN(ts_ms) AS first_ms, MAX(ts_ms) AS last_ms
        |FROM rep GROUP BY 1, 2 HAVING COUNT(*) >= 3""".stripMargin,
      "brakes" -> brakes)
  }

  test("followedBy pairs events within the gap on the same key") {
    import spark.implicits._
    val a = Seq((1, 0L, "x"), (1, 100L, "y"), (2, 0L, "z")).toDF("k", "ts_ms", "tag")
    val b = Seq((1, 50L, "p"), (1, 500L, "q"), (2, 400L, "r")).toDF("k", "ts_ms", "tag")
    val out = Cep.followedBy(a, b, Seq("k"), "ts_ms", 300L)
      .select("k", "a_tag", "b_tag").collect()
      .map(r => (r.getInt(0), r.getString(1), r.getString(2))).toSet
    // x~>p (50-0), y~>q? q at 500, y at 100, gap 400 > 300 -> no.
    // x~>q? gap 500 > 300 -> no. z~>r? not in b for k=2 within 300? 400-0=400 > 300 -> no.
    assert(out == Set((1, "x", "p")))
  }

  test("followedBy enforces temporal order (b not before a)") {
    import spark.implicits._
    val a = Seq((1, 1000L, "x")).toDF("k", "ts_ms", "tag")
    val b = Seq((1, 500L, "p")).toDF("k", "ts_ms", "tag")
    assert(Cep.followedBy(a, b, Seq("k"), "ts_ms", 10000L).count() == 0)
  }

  test("followedBy allows b at exactly a's timestamp and at the gap bound") {
    import spark.implicits._
    val a = Seq((1, 1000L, "x")).toDF("k", "ts_ms", "tag")
    val b = Seq((1, 1000L, "p"), (1, 1300L, "q"), (1, 1301L, "r")).toDF("k", "ts_ms", "tag")
    val tags = Cep.followedBy(a, b, Seq("k"), "ts_ms", 300L)
      .select("b_tag").collect().map(_.getString(0)).toSet
    assert(tags == Set("p", "q"))
  }
}
