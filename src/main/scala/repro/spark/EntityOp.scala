package repro.spark

import repro.core._
import repro.core.Events._
import repro.core.Dataflow.DataflowGraph

/** Per-key operator logic shared by the Spark batch and streaming runtimes.
  *
  * Both runtimes key the event stream by the entity routing key
  * `class|key` (the paper's ingress keyBy on class name + entity key) and
  * hand each group to [[processKey]], which folds the group's packets over
  * the entity's serialized state. The two runtimes differ only in where the
  * serialized state lives: a state `Dataset` threaded through `cogroup`
  * rounds (batch) or Spark's `GroupState` (Structured Streaming).
  */
object EntityOp {

  /** Wire row entering an operator. `kind` is `seed` (body = field-map JSON
    * merged into entity state) or `ev` (body = encoded [[Events.Invoke]]). */
  final case class PacketRow(key: String, rid: String, seq: Long, kind: String, body: String)

  /** Wire row leaving an operator. `tag` is `s` (body = the entity's new
    * serialized state; `key` = routing key) or `e` (an event: `kind` is
    * `ev` for a hop that must re-enter the dataflow — the paper's Kafka
    * loop — or `reply` for an egress answer, body = value JSON). */
  final case class OutRow(tag: String, key: String, rid: String, seq: Long, kind: String, body: String)

  val KindSeed  = "seed"
  val KindEvent = "ev"
  val KindReply = "reply"
  val TagState  = "s"
  val TagEvent  = "e"

  def seedPacket(clazz: String, key: String, fields: Map[String, Value]): PacketRow =
    PacketRow(EntityAddr(clazz, key).routingKey, "", 0L, KindSeed, Codec.encodeEnv(fields))

  def eventPacket(ev: Invoke): PacketRow =
    PacketRow(ev.target.routingKey, ev.requestId, ev.seq, KindEvent, Events.encode(ev))

  /** Deterministic processing order inside one micro-batch/round: seeds
    * first (empty rid sorts first), then by (request id, hop sequence). */
  def sortKey(p: PacketRow): (String, Long) = (p.rid, p.seq)

  /** Fold `packets` over the entity state serialized in `state0`; returns
    * the new serialized state (if the entity materialized) and the emitted
    * event rows. */
  def processKey(
      graph: DataflowGraph,
      routingKey: String,
      state0: Option[String],
      packets: Seq[PacketRow],
  ): (Option[String], Seq[OutRow]) = {
    val addr = EntityAddr.fromRoutingKey(routingKey)
    var fields: Option[Map[String, Value]] = state0.map(Codec.decodeEnv)
    val outs = Seq.newBuilder[OutRow]
    packets.sortBy(sortKey).foreach { p =>
      p.kind match {
        case KindSeed =>
          val base = fields.getOrElse(graph.operator(addr.clazz).initialState(addr.key))
          fields = Some(base ++ Codec.decodeEnv(p.body))
        case KindEvent =>
          val ev = Events.decode(p.body).asInstanceOf[Invoke]
          val res = OperatorExec.step(graph, fields, ev)
          fields = Some(res.fields)
          res.out match {
            case next: Invoke =>
              outs += OutRow(TagEvent, next.target.routingKey, next.requestId, next.seq,
                             KindEvent, Events.encode(next))
            case Reply(rid, v) =>
              outs += OutRow(TagEvent, "", rid, Long.MaxValue, KindReply, Codec.encodeValue(v))
          }
        case other =>
          throw new IllegalArgumentException(s"unknown packet kind $other")
      }
    }
    (fields.map(Codec.encodeEnv), outs.result())
  }
}
