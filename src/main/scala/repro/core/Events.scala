package repro.core

import Json._

/** The event model (§2.2, Table 1).
  *
  * Table 1's mapping, realized:
  *  - Class                    → Operator           ([[Dataflow.OperatorDef]])
  *  - Object state             → Operator state     (field map, per key)
  *  - Function call arguments  → Event header       ([[Invoke]] env/method/block)
  *  - Return value             → Event payload      ([[Reply]] value / popped frame result)
  *
  * An [[Invoke]] event routes by `(target.clazz, target.key)` — the paper's
  * ingress "keyBy" on class name + entity key. The distributed call stack of
  * [[Frame]]s is the paper's *execution graph*: it records where to resume
  * (caller entity, method, continuation block), the suspended local
  * environment (intermediate results), and which variable receives the
  * callee's return value.
  */
object Events {

  /** Address of a stateful entity: the routing key of the dataflow. */
  final case class EntityAddr(clazz: String, key: String) {
    /** Canonical routing key used by every runtime's partitioner. */
    def routingKey: String = s"$clazz|$key"
  }
  object EntityAddr {
    def fromRoutingKey(s: String): EntityAddr = {
      val i = s.indexOf('|')
      require(i > 0, s"bad routing key: $s")
      EntityAddr(s.substring(0, i), s.substring(i + 1))
    }
  }

  /** One suspended caller on the distributed call stack. */
  final case class Frame(
      caller: EntityAddr,
      method: String,
      contBlock: Int,
      env: Map[String, Value],
      resultVar: String,
  )

  sealed trait Event {
    def requestId: String
  }

  /** Function-invocation (or resumption) event. `block` is the state-machine
    * block to start at — the method entry for a fresh call, a continuation
    * block when a remote call's result comes back (then `env` already
    * contains the result bound to the caller's result variable). */
  final case class Invoke(
      requestId: String,
      seq: Long,
      target: EntityAddr,
      method: String,
      block: Int,
      env: Map[String, Value],
      stack: List[Frame],
  ) extends Event

  /** Egress event: the outermost call returned `value` to the client. */
  final case class Reply(requestId: String, value: Value) extends Event

  // ------------------------------------------------------------- wire codec

  def frameToJson(f: Frame): J = JObj.of(
    "c" -> JStr(f.caller.clazz), "k" -> JStr(f.caller.key),
    "m" -> JStr(f.method), "b" -> JInt(f.contBlock),
    "e" -> Codec.envToJson(f.env), "r" -> JStr(f.resultVar),
  )

  def frameFromJson(j: J): Frame = {
    val o = j.asInstanceOf[JObj]
    Frame(
      EntityAddr(o("c").asInstanceOf[JStr].v, o("k").asInstanceOf[JStr].v),
      o("m").asInstanceOf[JStr].v,
      o("b").asInstanceOf[JInt].v.toInt,
      Codec.envFromJson(o("e")),
      o("r").asInstanceOf[JStr].v,
    )
  }

  def toJson(ev: Event): J = ev match {
    case Invoke(rid, seq, t, m, b, env, stack) => JObj.of(
      "t"   -> JStr("inv"),
      "rid" -> JStr(rid),
      "seq" -> JInt(seq),
      "cls" -> JStr(t.clazz), "key" -> JStr(t.key),
      "m"   -> JStr(m), "b" -> JInt(b),
      "env" -> Codec.envToJson(env),
      "stk" -> JArr(stack.map(frameToJson).toVector),
    )
    case Reply(rid, v) => JObj.of(
      "t" -> JStr("rep"), "rid" -> JStr(rid), "v" -> Codec.valueToJson(v),
    )
  }

  def fromJson(j: J): Event = {
    val o = j.asInstanceOf[JObj]
    o("t").asInstanceOf[JStr].v match {
      case "inv" => Invoke(
        o("rid").asInstanceOf[JStr].v,
        o("seq").asInstanceOf[JInt].v,
        EntityAddr(o("cls").asInstanceOf[JStr].v, o("key").asInstanceOf[JStr].v),
        o("m").asInstanceOf[JStr].v,
        o("b").asInstanceOf[JInt].v.toInt,
        Codec.envFromJson(o("env")),
        o("stk").asInstanceOf[JArr].items.map(frameFromJson).toList,
      )
      case "rep" => Reply(o("rid").asInstanceOf[JStr].v, Codec.valueFromJson(o("v")))
      case t     => throw new IllegalArgumentException(s"bad event tag $t")
    }
  }

  def encode(ev: Event): String = render(toJson(ev))
  def decode(s: String): Event  = fromJson(parse(s))
}
