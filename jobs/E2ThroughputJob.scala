package repro.jobs

import repro.bench.{Experiments, TableFmt}
import repro.bench.TableFmt._

/** spark-submit entrypoint for Table E2 (paper Fig. 4): mixed-workload
  * latency vs offered load. Pure simulation over real compiled hop traces;
  * no cluster state needed.
  *
  * Usage: spark-submit --class repro.jobs.E2ThroughputJob <jar> [windowS]
  */
object E2ThroughputJob {
  def main(args: Array[String]): Unit = {
    val windowS = args.headOption.map(_.toDouble).getOrElse(3.5)
    val rows = Experiments.e2Sweep(windowS)
    println(TableFmt.render(
      "E2 — mixed workload latency vs offered load (ms, simulated deployments)",
      Seq("runtime", "rps", "avg", "p50", "p99"),
      rows.map(r => Seq(r.runtime, r.rps.toString, fmtMs(r.avgMs), fmtMs(r.p50Ms), fmtMs(r.p99Ms)))))
    println(f"pyflink exec utilization at 150 RPS: " +
      f"${Experiments.e2PyflinkSaturation() * 100}%.1f%% (timeouts; excluded from sweep)")
  }
}
