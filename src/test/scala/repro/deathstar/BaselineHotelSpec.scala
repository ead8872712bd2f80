package repro.deathstar

import repro.SparkSpec
import repro.core._
import repro.core.Value._
import repro.faas.SimKV
import repro.runtime.LocalRuntime

/** The baseline ("Go-style") hotel implementation must behave exactly like
  * the StateFlow version — the LOC comparison is between two working ports
  * of the same service. */
class BaselineHotelSpec extends SparkSpec {

  private def freshPair(): (BaselineHotel, LocalRuntime) = {
    val base = new BaselineHotel(new SimKV())
    base.seed(2, 8, 5)
    val rt = new LocalRuntime(Compiler.compile(HotelApp.program))
    HotelApp.seeds(2, 8, 5).foreach { case (c, k, f) => rt.seed(c, k, f) }
    (base, rt)
  }

  test("login agrees with StateFlow") {
    val (base, rt) = freshPair()
    assert(base.login("u-1", "pw-1") ==
      rt.invoke("User", "u-1", "login", List(str("pw-1"))).asBool)
    assert(base.login("u-1", "nope") ==
      rt.invoke("User", "u-1", "login", List(str("nope"))).asBool)
  }

  test("search agrees with StateFlow") {
    val (base, rt) = freshPair()
    val expected = rt.invoke("Search", "reg-0", "search", List(int(1), int(3)))
      .asList.map(_.asStr)
    assert(base.search("reg-0", 1, 3) == expected)
  }

  test("recommend agrees with StateFlow") {
    val (base, rt) = freshPair()
    val expected = rt.invoke("Recommendation", "reg-1", "recommend", List(int(3)))
      .asList.map(_.asStr)
    assert(base.recommend("reg-1", 3) == expected)
  }

  test("reserve agrees with StateFlow, including capacity refusal") {
    val (base, rt) = freshPair()
    (0 until 12).foreach { i =>
      val b = base.reserve("reg-0", s"u-${i % 5}", "h-0-2", 1, 3)
      val s = rt.invoke("Reservation", "reg-0", "reserve",
        List(ref("User", s"u-${i % 5}"), ref("Hotel", "h-0-2"), int(1), int(3))).asBool
      assert(b == s, s"attempt $i")
    }
  }

  test("search reflects reservations in both implementations") {
    val (base, rt) = freshPair()
    (0 until 10).foreach { _ =>
      base.reserve("reg-0", "u-0", "h-0-0", 1, 2)
      rt.invoke("Reservation", "reg-0", "reserve",
        List(ref("User", "u-0"), ref("Hotel", "h-0-0"), int(1), int(2)))
    }
    assert(base.search("reg-0", 1, 3) ==
      rt.invoke("Search", "reg-0", "search", List(int(1), int(3))).asList.map(_.asStr))
  }

  test("request router envelope round-trips") {
    val (base, _) = freshPair()
    val resp = base.handle("""{"endpoint":"login","user":"u-2","password":"pw-2"}""")
    assert(resp == """{"status":"ok","result":true}""")
    val err = base.handle("""{"endpoint":"nope","user":"x","password":"y"}""")
    assert(err.contains("unknown endpoint"))
  }

  // --------------------------------------------------------------- E4 LOC

  test("LOC: baseline is substantially larger than the StateFlow program (paper: ~2.5x)") {
    val sf = Loc.stateflowHotel
    val bl = Loc.baselineHotel
    assert(bl.total > 1.5 * sf.total,
      s"baseline ${bl.total} LOC should dwarf stateflow ${sf.total} LOC")
  }

  test("LOC: baseline carries a substantial infra share; Scala compresses business logic harder than Go, so the share overshoots the paper's 30%") {
    val bl = Loc.baselineHotel
    assert(bl.infraShare > 0.25 && bl.infraShare < 0.70,
      f"infra share ${bl.infraShare * 100}%.1f%%")
    assert(bl.infra > 100, "serde+DAO+stubs are the bulk of a microservice port")
  }

  test("LOC: StateFlow program contains no infrastructure code") {
    assert(Loc.stateflowHotel.infra == 0)
  }

  test("LOC: switching runtimes costs ~2 lines per target (<10, paper claim)") {
    val sw = Loc.runtimeSwitch
    // 4 runtime targets + imports + compile line in one file: each switch is
    // a one-liner, comfortably under the paper's 10-line bound.
    assert(sw.total < 18, s"runtime switch file has ${sw.total} code lines")
  }
}
