package repro.faas

import java.util.concurrent.ConcurrentHashMap
import java.util.concurrent.locks.ReentrantLock

/** Simulated external key-value state backend (the paper's DynamoDB).
  *
  * FaaS runtimes are stateless: entity state lives in an external store
  * accessed per invocation (§3 "FaaS"). This simulation preserves the two
  * properties the paper's evaluation leans on:
  *
  *  - an access-latency cost per get/put (`latencyNanos`, injected with a
  *    spin-wait so concurrency tests keep real interleavings);
  *  - **no locking by default** — the paper disabled DynamoDB locking
  *    because it "deteriorated performance significantly", accepting
  *    read-modify-write races. `withLocks = true` restores per-key mutual
  *    exclusion so tests can demonstrate the difference.
  */
final class SimKV(latencyNanos: Long = 0L, val withLocks: Boolean = false) {

  private val data = new ConcurrentHashMap[String, String]()
  private val locks = new ConcurrentHashMap[String, ReentrantLock]()

  /** Telemetry: number of store operations (for the overhead experiment). */
  val gets = new java.util.concurrent.atomic.AtomicLong(0)
  val puts = new java.util.concurrent.atomic.AtomicLong(0)

  private def simulateLatency(): Unit =
    if (latencyNanos > 0) {
      val end = System.nanoTime() + latencyNanos
      while (System.nanoTime() < end) {} // spin: keeps threads runnable
    }

  def get(key: String): Option[String] = {
    simulateLatency()
    gets.incrementAndGet()
    Option(data.get(key))
  }

  def put(key: String, value: String): Unit = {
    simulateLatency()
    puts.incrementAndGet()
    data.put(key, value)
  }

  /** Per-key critical section, honored only when `withLocks` is set —
    * otherwise the body runs unprotected (the paper's production setting). */
  def withKeyLock[T](key: String)(body: => T): T =
    if (!withLocks) body
    else {
      val l = locks.computeIfAbsent(key, _ => new ReentrantLock())
      l.lock()
      try body finally l.unlock()
    }

  def snapshot: Map[String, String] = {
    val b = Map.newBuilder[String, String]
    data.forEach((k, v) => b += (k -> v))
    b.result()
  }
}
