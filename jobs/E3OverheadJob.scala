package repro.jobs

import repro.bench.{Experiments, TableFmt}
import repro.bench.TableFmt._

/** spark-submit entrypoint for Table E3 (paper §4 "System overhead"):
  * per-event component breakdown vs state size.
  *
  * Usage: spark-submit --class repro.jobs.E3OverheadJob <jar> [events]
  */
object E3OverheadJob {
  def main(args: Array[String]): Unit = {
    val events = args.headOption.map(_.toInt).getOrElse(300)
    val rows = Experiments.e3Overhead(events)
    println(TableFmt.render(
      "E3 — per-event component time (µs) vs state size",
      Seq("state KB", "routing", "env decode", "state decode", "construct",
          "exec", "state encode", "store", "stateflow share"),
      rows.map { b =>
        Seq(b.stateKb.toString,
            fmtMs(b.routingNs / 1000), fmtMs(b.headerDecodeNs / 1000),
            fmtMs(b.stateDecodeNs / 1000), fmtMs(b.constructNs / 1000),
            fmtMs(b.execNs / 1000), fmtMs(b.stateEncodeNs / 1000),
            fmtMs(b.storeNs / 1000), fmtPct(b.stateflowShare))
      }))
  }
}
