package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Harness

/** Regenerates Table 2 (MEOS-style pruning vs naive generic-engine
  * baseline).
  *
  * Usage: spark-submit --class repro.jobs.BaselineTable repro.jar [sf]
  */
object BaselineTable {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.05)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("baseline-table")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val (ev, zones, _) = Harness.inputs(spark, sf)
      print(Harness.formatT2(Harness.runT2(spark, ev, zones), sf))
    } finally spark.stop()
  }
}
