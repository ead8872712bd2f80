package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.{Experiments, TableFmt}
import repro.bench.TableFmt._

/** spark-submit entrypoint for Table E1 (paper Fig. 3): per-endpoint
  * latency across runtimes — simulated deployments plus the real Spark
  * Structured Streaming runtime.
  *
  * Usage: spark-submit --class repro.jobs.E1LatencyJob <jar> [nRequests]
  */
object E1LatencyJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(500)
    val spark = SparkSession.builder.appName("E1Latency")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val rows = Experiments.e1Simulated(n)
      println(TableFmt.render(
        "E1 — avg latency per endpoint at 10 RPS (ms, simulated deployments)",
        "runtime" +: Experiments.endpoints,
        rows.groupBy(_.runtime).toSeq.sortBy(_._1).map { case (rt, rs) =>
          rt +: Experiments.endpoints.map(ep => fmtMs(rs.find(_.endpoint == ep).get.stats.avgMs))
        }))
      val measured = Experiments.e1SparkMeasured(spark)
      println(TableFmt.render(
        "E1b — Spark Structured Streaming runtime (measured, ms/request)",
        Seq("endpoint", "avg ms"),
        measured.map { case (ep, ms) => Seq(ep, fmtMs(ms)) }))
    } finally spark.stop()
  }
}
