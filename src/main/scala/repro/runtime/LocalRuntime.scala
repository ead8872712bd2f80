package repro.runtime

import scala.collection.mutable
import repro.core._
import repro.core.Events._
import repro.core.Dataflow.DataflowGraph

/** The Local target runtime (§3).
  *
  * Executes the compiled dataflow graph in-process with HashMap state — the
  * environment the paper recommends for debugging and unit-testing a
  * StateFlow program before deploying it to a distributed runtime. Events
  * travel through a FIFO queue standing in for the ingress/egress routers;
  * each dequeue is one "hop" (what Kafka re-entry does in the distributed
  * deployments), so [[hops]] counts exactly the events a distributed
  * runtime would move.
  */
final class LocalRuntime(val graph: DataflowGraph, val store: StateStore = new HashMapStateStore) {

  /** Total events processed (initial invocations + all remote-call and
    * return hops). */
  var hops: Long = 0L

  /** Per-request hop trace: sequence of entity addresses that processed an
    * event for the request, in order. Used by the discrete-event simulator
    * to replay real request chains, and by tests to check hop counts. */
  val traces = mutable.Map.empty[String, Vector[EntityAddr]]

  private var nextRequest = 0L

  /** Seed an entity's state directly (workload initialization). */
  def seed(clazz: String, key: String, fields: Map[String, Value]): Unit = {
    val base = graph.operator(clazz).initialState(key)
    store.put(clazz, key, base ++ fields)
  }

  /** Invoke an entity method and run the dataflow to completion; returns
    * the client-visible return value. */
  def invoke(clazz: String, key: String, method: String, args: List[Value]): Value = {
    val rid = f"r$nextRequest%012d"
    nextRequest += 1
    val replies = run(List(OperatorExec.initialEvent(graph, rid, EntityAddr(clazz, key), method, args)))
    replies(rid)
  }

  /** Process a batch of initial events to completion; returns the reply
    * value per request id. */
  def run(initial: List[Invoke]): Map[String, Value] = {
    val queue = mutable.Queue.empty[Invoke]
    queue ++= initial
    val replies = mutable.Map.empty[String, Value]
    while (queue.nonEmpty) {
      val ev = queue.dequeue()
      hops += 1
      traces.updateWith(ev.requestId)(t => Some(t.getOrElse(Vector.empty) :+ ev.target))
      val res = OperatorExec.step(graph, store.get(ev.target.clazz, ev.target.key), ev)
      store.put(ev.target.clazz, ev.target.key, res.fields)
      res.out match {
        case next: Invoke      => queue += next
        case Reply(rid, value) => replies(rid) = value
      }
    }
    replies.toMap
  }

  /** Snapshot of one entity's state (defaults if never touched). */
  def snapshot(clazz: String, key: String): Map[String, Value] =
    store.get(clazz, key).getOrElse(graph.operator(clazz).initialState(key))
}
