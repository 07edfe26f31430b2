package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators stay usable alongside the train
  * stream (and give the oracle an independent, non-spatial workout).
  */
class SynthDataSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, 0.001).cache()
  private lazy val ord = SynthData.orders(spark, 0.001).cache()

  test("lineitem row count scales with sf") {
    assert(li.count() == 6000L)
    assert(SynthData.lineitem(spark, 0.0001).count() == 600L)
  }

  test("lineitem domains") {
    val r = li.agg(min("l_quantity"), max("l_quantity"),
      min("l_discount"), max("l_discount")).head()
    assert(r.getDouble(0) >= 1.0 && r.getDouble(1) <= 51.0)
    assert(r.getDouble(2) >= 0.0 && r.getDouble(3) <= 0.10)
  }

  test("TPC-H Q1-like aggregate matches DuckDB") {
    val out = li.groupBy("l_returnflag", "l_linestatus")
      .agg(sum("l_quantity").as("sum_qty"),
        sum(col("l_extendedprice") * (lit(1.0) - col("l_discount"))).as("sum_disc_price"),
        count(lit(1)).as("n"))
    Oracle.assertEquivalent(out,
      """SELECT l_returnflag, l_linestatus,
        |       SUM(CAST(l_quantity AS DOUBLE)) AS sum_qty,
        |       SUM(CAST(l_extendedprice AS DOUBLE) * (1.0 - CAST(l_discount AS DOUBLE))) AS sum_disc_price,
        |       COUNT(*) AS n
        |FROM lineitem GROUP BY 1, 2""".stripMargin,
      "lineitem" -> li)
  }

  test("join lineitem-orders matches DuckDB") {
    val out = li.join(ord, col("l_orderkey") === col("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(out,
      """SELECT o_orderstatus, COUNT(*) AS n
        |FROM lineitem JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT)
        |GROUP BY 1""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .head().getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).limit(1)
      .head().getLong(1)
    assert(zTop > uTop * 3, s"zipf top=$zTop uniform top=$uTop")
  }
}
