package repro.bench

import repro.SparkSpec
import TableFmt._

/** Table E1 (paper Figure 3): average latency per DeathStar endpoint at
  * 10 RPS across runtimes — simulated deployments on real compiled hop
  * traces, plus the real Spark Structured Streaming runtime measured.
  *
  * Paper's qualitative results to reproduce: AWS Lambda fastest on every
  * endpoint; PyFlink slowest by a wide margin; search is the most expensive
  * endpoint everywhere (9 entity calls); dataflow runtimes pay a Kafka
  * round trip per entity call.
  */
class E1LatencyBench extends SparkSpec {

  private lazy val rows = Experiments.e1Simulated()
  private def avg(rt: String, ep: String): Double =
    rows.find(r => r.runtime == rt && r.endpoint == ep).get.stats.avgMs

  test("E1: print the Fig-3 table (simulated deployments)") {
    val table = TableFmt.render(
      "E1 — avg latency per endpoint at 10 RPS (ms, simulated deployments)",
      "runtime" +: Experiments.endpoints,
      rows.groupBy(_.runtime).toSeq.sortBy(_._1).map { case (rt, rs) =>
        rt +: Experiments.endpoints.map(ep => fmtMs(rs.find(_.endpoint == ep).get.stats.avgMs))
      })
    println(table)
    assert(rows.size == 16)
  }

  test("E1: lambda is the fastest runtime on every endpoint (paper)") {
    Experiments.endpoints.foreach { ep =>
      List("statefun", "flinkjvm", "pyflink").foreach { other =>
        assert(avg("lambda", ep) < avg(other, ep), s"$ep: lambda vs $other")
      }
    }
  }

  test("E1: pyflink is the slowest runtime on every endpoint (paper)") {
    Experiments.endpoints.foreach { ep =>
      List("lambda", "statefun", "flinkjvm").foreach { other =>
        assert(avg("pyflink", ep) > avg(other, ep), s"$ep: pyflink vs $other")
      }
    }
  }

  test("E1: search is the most expensive endpoint on every runtime (paper)") {
    List("lambda", "statefun", "flinkjvm", "pyflink").foreach { rt =>
      List("login", "recommend", "reserve").foreach { ep =>
        assert(avg(rt, "search") > avg(rt, ep), s"$rt: search vs $ep")
      }
    }
  }

  test("E1: dataflow runtimes pay ~20ms Kafka round trip per hop") {
    // search = 17 hops; statefun must cost at least 16 re-entries.
    assert(avg("statefun", "search") > 16 * 20.0)
    // login = 1 hop: no re-entry, so statefun login is well under one
    // search hop budget.
    assert(avg("statefun", "login") < 60.0)
  }

  test("E1: the real Spark Structured Streaming runtime, measured") {
    val measured = Experiments.e1SparkMeasured(spark)
    println(TableFmt.render(
      "E1b — Spark Structured Streaming runtime (measured, ms/request; " +
        "each remote hop = one micro-batch)",
      Seq("endpoint", "avg ms"),
      measured.map { case (ep, ms) => Seq(ep, fmtMs(ms)) }))
    val m = measured.toMap
    // Same shape as every dataflow runtime: search (17 hop-batches) dwarfs
    // login (1 hop-batch).
    assert(m("search") > m("login"))
    assert(m("search") > m("recommend"))
    assert(measured.forall(_._2 > 0))
  }
}
