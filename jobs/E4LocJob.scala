package repro.jobs

import repro.bench.{Experiments, TableFmt}
import repro.bench.TableFmt._

/** spark-submit entrypoint for Table E4 (paper §4 LOC comparison).
  *
  * Usage: spark-submit --class repro.jobs.E4LocJob <jar>
  * (must run from the repository so sources are on disk)
  */
object E4LocJob {
  def main(args: Array[String]): Unit = {
    val r = Experiments.e4Loc()
    println(TableFmt.render(
      "E4 — lines of code (paper: stateflow ±200, baseline ±500 w/ ~30% infra, switch <10)",
      Seq("implementation", "total LOC", "infra LOC", "infra share"),
      Seq(
        Seq("stateflow hotel (python)", r.stateflowLoc.toString, "0", "0%"),
        Seq("baseline microservices", r.baselineLoc.toString, r.baselineInfra.toString,
            fmtPct(r.baselineInfraShare)),
        Seq("runtime switch (4 targets)", r.switchLoc.toString, "-", "-"),
      )))
  }
}
