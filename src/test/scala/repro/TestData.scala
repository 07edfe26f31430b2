package repro

import org.apache.spark.sql.DataFrame

import repro.core.NebulaMeos
import repro.sncb.{RailNetwork, TrainData}

/** Shared, cached test inputs. One JVM runs all suites (see build.sbt),
  * so these materialize once. MEOS functions are registered on first
  * access.
  */
object TestData {

  private def spark = {
    val s = SparkSpec.shared
    NebulaMeos.setup(s)
    s
  }

  /** ~12K events (2K seconds x 6 trains) — oracle-comparison scale. */
  lazy val events002: DataFrame = {
    val df = TrainData.events(spark, sf = 0.002).cache()
    df.count()
    df
  }

  /** ~60K events — planted-positive / streaming-equality scale. */
  lazy val events01: DataFrame = {
    val df = TrainData.events(spark, sf = 0.01).cache()
    df.count()
    df
  }

  lazy val zones: DataFrame = {
    val df = RailNetwork.zonesDf(spark).cache()
    df.count()
    df
  }

  /** One hour of weather covers events002 (2000 s); two hours margin. */
  lazy val weather: DataFrame = {
    val df = TrainData.weather(spark, hours = 4).cache()
    df.count()
    df
  }
}
