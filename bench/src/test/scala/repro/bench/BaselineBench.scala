package repro.bench

import repro.SparkSpec

/** Table 2 — MEOS-style spatial pruning vs the naive generic-engine
  * baseline (cross-join + generic point-in-polygon, no pushdown).
  *
  * The paper's qualitative claim: integrating spatiotemporal operators
  * into the engine (instead of custom code on Kafka/Flink) avoids
  * "complexity and resource overhead". The reproduced quantitative
  * shape: every MEOS-style query is at least as fast as its naive
  * twin, and the zone-membership queries are several times faster.
  */
class BaselineBench extends SparkSpec {

  private val sf = sys.env.getOrElse("BENCH_BASELINE_SF", "0.05").toDouble

  test("Table 2: MEOS-style vs naive baseline wall-clock") {
    val (ev, zones, _) = Harness.inputs(spark, sf)
    val rows = Harness.runT2(spark, ev, zones)
    println(Harness.formatT2(rows, sf))

    rows.foreach { case (label, m, n) =>
      assert(m > 0 && n > 0, s"$label: non-positive timing")
    }
    // Aggregate shape: total naive time must exceed total MEOS time.
    val meosTotal = rows.map(_._2).sum
    val naiveTotal = rows.map(_._3).sum
    assert(naiveTotal > meosTotal,
      f"naive ($naiveTotal%.1fs) should be slower than MEOS-style ($meosTotal%.1fs)")
    // The pure zone-membership queries (Q1, Q3) must show a clear win.
    val zoneWins = rows.filter(r => r._1.startsWith("Q1") || r._1.startsWith("Q3"))
    zoneWins.foreach { case (label, m, n) =>
      assert(n > m, s"$label: expected the naive cross-join to be slower")
    }
  }
}
