package repro

import org.apache.spark.sql.functions._

/** Self-test of the DuckDB oracle: it must accept equal results and
  * reject wrong ones (otherwise every oracle-based test is vacuous).
  */
class OracleSpec extends SparkSpec {

  private lazy val t = {
    import spark.implicits._
    Seq((1, "a", 1.5), (2, "b", 2.5), (3, null, 3.5)).toDF("k", "s", "v").cache()
  }

  test("accepts an identical result") {
    Oracle.assertEquivalent(t.select("k", "s", "v"),
      "SELECT CAST(k AS INT) AS k, s, CAST(v AS DOUBLE) AS v FROM t", "t" -> t)
  }

  test("rejects a missing row") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(t.where(col("k") =!= 2).select("k", "s", "v"),
        "SELECT CAST(k AS INT) AS k, s, CAST(v AS DOUBLE) AS v FROM t", "t" -> t)
    }
  }

  test("rejects a changed value") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(t.withColumn("v", col("v") + 0.001).select("k", "s", "v"),
        "SELECT CAST(k AS INT) AS k, s, CAST(v AS DOUBLE) AS v FROM t", "t" -> t)
    }
  }

  test("rejects mismatched column sets") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(t.select("k", "v"),
        "SELECT CAST(k AS INT) AS k, s FROM t", "t" -> t)
    }
  }

  test("treats nulls consistently on both sides") {
    Oracle.assertEquivalent(t.where(col("s").isNull).select("k", "s"),
      "SELECT CAST(k AS INT) AS k, s FROM t WHERE s IS NULL", "t" -> t)
  }

  test("tolerates sub-1e-6 double noise") {
    Oracle.assertEquivalent(t.withColumn("v", col("v") + 1e-9).select("k", "v"),
      "SELECT CAST(k AS INT) AS k, CAST(v AS DOUBLE) AS v FROM t", "t" -> t)
  }
}
