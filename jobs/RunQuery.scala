package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Harness
import repro.core.{Gcep, Geofencing}

/** Runs one of the eight demo queries over the synthetic SNCB stream
  * and prints a result sample — the CLI stand-in for the paper's
  * Deck.gl dashboard.
  *
  * Usage: spark-submit --class repro.jobs.RunQuery repro.jar <1..8> [sf]
  */
object RunQuery {
  def main(args: Array[String]): Unit = {
    require(args.nonEmpty, "usage: RunQuery <queryNumber 1..8> [sf]")
    val qn = args(0).toInt
    val sf = args.drop(1).headOption.map(_.toDouble).getOrElse(0.01)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"run-query-$qn")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val (ev, zones, weather) = Harness.inputs(spark, sf)
      val out = qn match {
        case 1 => Geofencing.alertFiltering(ev, zones)
        case 2 => Geofencing.noiseMonitoring(ev, zones)
        case 3 => Geofencing.dynamicSpeedLimit(ev, zones)
        case 4 => Geofencing.weatherSpeedZones(ev, weather)
        case 5 => Gcep.batteryMonitoring(ev, zones)
        case 6 => Gcep.heavyPassengerLoad(ev)
        case 7 => Gcep.unscheduledStops(ev, zones)
        case 8 => Gcep.brakePatterns(ev)
        case _ => sys.error(s"unknown query $qn (expected 1..8)")
      }
      println(s"Query $qn over ${ev.count()} events -> ${out.count()} result rows")
      out.show(20, truncate = false)
    } finally spark.stop()
  }
}
