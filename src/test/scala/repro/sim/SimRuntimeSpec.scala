package repro.sim

import repro.SparkSpec
import repro.deathstar.Workload
import SimDataflowRuntime._

/** The deployment simulator: real compiled hop chains + the §4 cluster cost
  * models must reproduce the paper's qualitative results. */
class SimRuntimeSpec extends SparkSpec {

  private lazy val searchTraces    = hotelTraces(300, Workload.only("search"))
  private lazy val loginTraces     = hotelTraces(300, Workload.only("login"))
  private lazy val recommendTraces = hotelTraces(300, Workload.only("recommend"))
  private lazy val reserveTraces   = hotelTraces(300, Workload.only("reserve"))

  test("traces carry the compiler's hop counts, not hand-coded constants") {
    assert(loginTraces.forall(_.chain.length == 1))
    assert(searchTraces.forall(_.chain.length == 17)) // 1 + 2*8 remote calls
    assert(recommendTraces.forall(_.chain.length == 5))
    assert(reserveTraces.forall(_.chain.length == 5)) // success path
  }

  test("trace chains visit the expected operators") {
    val chain = searchTraces.head.chain.map(_.clazz)
    assert(chain.head == "Search")
    assert(chain.count(_ == "Hotel") == 5)
    assert(chain.count(_ == "Geo") == 1)
    assert(chain.last == "Search") // resumes end back at the orchestrator
  }

  test("simulation is deterministic for a fixed seed") {
    val a = simulate(RuntimeProfile.statefun, searchTraces, rps = 10, seed = 5)
    val b = simulate(RuntimeProfile.statefun, searchTraces, rps = 10, seed = 5)
    assert(a.overall == b.overall)
  }

  test("Fig 3 ordering at 10 RPS: lambda fastest, pyflink slowest") {
    val lat = RuntimeProfile.all.map { p =>
      p.name -> simulate(p, searchTraces, rps = 10).overall.avgMs
    }.toMap
    assert(lat("lambda") < lat("statefun"))
    assert(lat("statefun") < lat("pyflink"))
    assert(lat("flinkjvm") < lat("pyflink"))
  }

  test("search is the slowest endpoint on every runtime (global state access)") {
    RuntimeProfile.all.foreach { p =>
      val s = simulate(p, searchTraces, rps = 10).overall.avgMs
      val l = simulate(p, loginTraces, rps = 10).overall.avgMs
      val r = simulate(p, recommendTraces, rps = 10).overall.avgMs
      assert(s > r && r > l, s"${p.name}: search $s, recommend $r, login $l")
    }
  }

  test("per-hop Kafka round trip dominates dataflow latency (paper's observation)") {
    val stf = simulate(RuntimeProfile.statefun, searchTraces, rps = 10).overall.avgMs
    // 17 hops * ~20ms transport: latency must be in the hundreds of ms
    assert(stf > 250 && stf < 900, s"statefun search avg $stf ms")
    val lam = simulate(RuntimeProfile.awsLambda, searchTraces, rps = 10).overall.avgMs
    assert(lam < 250, s"lambda search avg $lam ms")
  }

  // Overload latency grows with observation time; 15k requests at 4300 RPS
  // is a ~3.5 s window, enough for the statefun backlog to pass 2 s.
  private lazy val mixedTraces = hotelTraces(15000, Workload.paperMix)

  test("Fig 4 knee: statefun collapses past its remote-worker capacity") {
    val low  = simulate(RuntimeProfile.statefun, mixedTraces, rps = 1200).overall
    val high = simulate(RuntimeProfile.statefun, mixedTraces, rps = 4300).overall
    assert(high.p99Ms > 2000, s"expected >2s p99 at 4300 RPS, got ${high.p99Ms}")
    assert(high.p99Ms > 4 * low.p99Ms, "latency must blow up past the knee")
  }

  test("Fig 4: lambda stays flat to 4300 RPS") {
    val low  = simulate(RuntimeProfile.awsLambda, mixedTraces, rps = 1200).overall
    val high = simulate(RuntimeProfile.awsLambda, mixedTraces, rps = 4300).overall
    assert(high.p99Ms < 400, s"lambda p99 at 4300 RPS: ${high.p99Ms}")
    assert(high.p99Ms < 2.0 * low.p99Ms, "no knee for lambda in the measured range")
  }

  test("Fig 4: flinkjvm degrades more gradually than statefun") {
    val stf = simulate(RuntimeProfile.statefun, mixedTraces, rps = 4300).overall.p99Ms
    val fj  = simulate(RuntimeProfile.flinkJvm, mixedTraces, rps = 4300).overall.p99Ms
    assert(fj < stf, s"flinkjvm $fj should beat statefun $stf at 4300 RPS")
  }

  test("pyflink saturates at very low throughput (excluded from Fig 4)") {
    val mixed = hotelTraces(1200, Workload.paperMix)
    val r = simulate(RuntimeProfile.pyFlink, mixed, rps = 150)
    assert(r.execUtilization > 0.95 || r.overall.p99Ms > 5000,
      s"pyflink should be saturated at 150 RPS: util=${r.execUtilization} p99=${r.overall.p99Ms}")
  }

  test("utilization accounting sane at low load") {
    val r = simulate(RuntimeProfile.awsLambda, loginTraces, rps = 10)
    assert(r.execUtilization > 0 && r.execUtilization < 0.05)
  }

  test("stats: p50 <= p99 and avg within range") {
    val r = simulate(RuntimeProfile.statefun, recommendTraces, rps = 50).overall
    assert(r.p50Ms <= r.p99Ms)
    assert(r.avgMs >= r.p50Ms * 0.5 && r.avgMs <= r.p99Ms)
    assert(r.n == 300)
  }
}
