package repro.sim

import repro.SparkSpec
import scala.collection.mutable

/** Discrete-event simulation core: ordering, FIFO queueing, utilization. */
class DesSpec extends SparkSpec {

  test("events fire in time order") {
    val des = new Des
    val order = mutable.ArrayBuffer.empty[Int]
    des.schedule(30)(order += 3)
    des.schedule(10)(order += 1)
    des.schedule(20)(order += 2)
    des.run()
    assert(order.toList == List(1, 2, 3))
    assert(des.now == 30.0)
  }

  test("ties break by insertion order (determinism)") {
    val des = new Des
    val order = mutable.ArrayBuffer.empty[Int]
    (0 until 5).foreach(i => des.schedule(5)(order += i))
    des.run()
    assert(order.toList == List(0, 1, 2, 3, 4))
  }

  test("nested scheduling advances time correctly") {
    val des = new Des
    var done = -1.0
    des.schedule(10) {
      des.schedule(15) { done = des.now }
    }
    des.run()
    assert(done == 25.0)
  }

  test("negative delays rejected") {
    val des = new Des
    intercept[IllegalArgumentException](des.schedule(-1)(()))
  }

  test("single-server pool serializes jobs FIFO") {
    val des = new Des
    val pool = new ServerPool(des, 1)
    val completions = mutable.ArrayBuffer.empty[(Int, Double)]
    des.schedule(0) {
      pool.submit(10) { completions += ((1, des.now)) }
      pool.submit(10) { completions += ((2, des.now)) }
      pool.submit(5)  { completions += ((3, des.now)) }
    }
    des.run()
    assert(completions.toList == List((1, 10.0), (2, 20.0), (3, 25.0)))
    assert(pool.maxQueue == 2)
  }

  test("c-server pool runs c jobs concurrently") {
    val des = new Des
    val pool = new ServerPool(des, 3)
    val completions = mutable.ArrayBuffer.empty[Double]
    des.schedule(0) {
      (0 until 3).foreach(_ => pool.submit(10) { completions += des.now })
      pool.submit(10) { completions += des.now } // must wait for a free server
    }
    des.run()
    assert(completions.toList == List(10.0, 10.0, 10.0, 20.0))
  }

  test("utilization accounting: busyMs sums service time") {
    val des = new Des
    val pool = new ServerPool(des, 2)
    des.schedule(0) {
      pool.submit(10) {}
      pool.submit(20) {}
    }
    des.run()
    assert(pool.busyMs == 30.0)
  }

  test("pool drains queue across waves") {
    val des = new Des
    val pool = new ServerPool(des, 2)
    var n = 0
    (0 until 20).foreach(i => des.schedule(i) { pool.submit(7) { n += 1 } })
    des.run()
    assert(n == 20)
  }
}
