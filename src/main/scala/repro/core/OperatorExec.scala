package repro.core

import scala.collection.mutable
import Events._
import StateMachine._
import Dataflow._

/** The operator logic every target runtime shares (§2.2).
  *
  * Given an invocation event and the entity's current field state, execute
  * function blocks *until the next suspension point*: run straight-line
  * statements and local control transfers inside this operator, and stop
  * when either a remote call must be made (emit an [[Events.Invoke]] to the
  * callee's operator — one event hop) or the function returns (pop the
  * distributed call stack, or emit an [[Events.Reply]] to the egress).
  *
  * This mirrors the paper precisely: "the entity's state is retrieved from
  * the local operator state [...] the function is executed using the
  * arguments found in the calling event, as well as the state of the entity
  * at the moment that the function is called."
  *
  * Runtimes differ only in where state lives (HashMap, Spark GroupState,
  * external KV) and how the emitted event travels (direct queue, Kafka-like
  * re-entry, new FaaS invocation) — exactly the paper's portability claim.
  */
object OperatorExec {

  /** Sentinel block id meaning "fresh call: start at the method entry". */
  val EntryBlock: Int = -1

  /** Result of processing one event at one operator: the entity's updated
    * field state and exactly one output event (the next hop or the reply). */
  final case class StepResult(fields: Map[String, Value], out: Event)

  /** Process `ev` against entity state `fields0` (None = entity not yet
    * materialized; it is created from field defaults). */
  def step(graph: DataflowGraph, fields0: Option[Map[String, Value]], ev: Invoke): StepResult = {
    val op = graph.operator(ev.target.clazz)
    val cd = graph.program.clazz(ev.target.clazz)
    val fields = mutable.Map.empty[String, Value]
    fields ++= fields0.getOrElse(op.initialState(ev.target.key))

    op.method(ev.method) match {
      case InlineMethod(_, fd) =>
        require(ev.block == EntryBlock,
          s"${ev.target.clazz}.${ev.method} is inline but got continuation block ${ev.block}")
        val vars = mutable.Map.empty[String, Value] ++ ev.env
        val ret = Eval.exec(fd.body, vars, fields, graph.program, cd, Eval.noRemote) match {
          case Eval.Returned(v) => v
          case Eval.FellThrough => Value.VUnit
        }
        StepResult(fields.toMap, finish(ev, ret))

      case SplitMethod(sm) =>
        val vars = mutable.Map.empty[String, Value] ++ ev.env
        var cur = if (ev.block == EntryBlock) sm.entry else ev.block
        while (true) {
          val b = sm.block(cur)
          Eval.exec(b.stmts, vars, fields, graph.program, cd, Eval.noRemote) match {
            case Eval.Returned(v) =>
              throw new IllegalStateException(s"return inside block statements of ${sm.clazz}.${sm.name}")
            case Eval.FellThrough => ()
          }
          b.term match {
            case Goto(t) => cur = t
            case CondBr(c, t, f) =>
              cur = if (Eval.expr(c, vars, fields, graph.program, cd, Eval.noRemote).asBool) t else f
            case CallTerm(tg, m, as, resultVar, cont) =>
              val ref = Eval.expr(tg, vars, fields, graph.program, cd, Eval.noRemote).asRef
              val argVals = as.map(a => Eval.expr(a, vars, fields, graph.program, cd, Eval.noRemote))
              val calleeOp = graph.operator(ref.clazz)
              val calleeParams = calleeOp.method(m).params
              require(calleeParams.length == argVals.length,
                s"${ref.clazz}.$m: arity mismatch at call from ${sm.clazz}.${sm.name}")
              val calleeEnv = calleeParams.map(_._1).zip(argVals).toMap
              val frame = Frame(ev.target, ev.method, cont, vars.toMap, resultVar)
              val out = Invoke(ev.requestId, ev.seq + 1, EntityAddr(ref.clazz, ref.key),
                               m, EntryBlock, calleeEnv, frame :: ev.stack)
              return StepResult(fields.toMap, out)
            case Ret(v) =>
              val ret = Eval.expr(v, vars, fields, graph.program, cd, Eval.noRemote)
              return StepResult(fields.toMap, finish(ev, ret))
          }
        }
        throw new IllegalStateException("unreachable")
    }
  }

  /** A function returned `ret`: resume the suspended caller (passing the
    * return value in the event, Table 1) or reply to the client. */
  private def finish(ev: Invoke, ret: Value): Event = ev.stack match {
    case Nil => Reply(ev.requestId, ret)
    case frame :: rest =>
      Invoke(ev.requestId, ev.seq + 1, frame.caller, frame.method, frame.contBlock,
             frame.env + (frame.resultVar -> ret), rest)
  }

  /** Build the client's initial invocation event. */
  def initialEvent(graph: DataflowGraph, requestId: String, target: EntityAddr,
                   method: String, args: List[Value]): Invoke = {
    val params = graph.operator(target.clazz).method(method).params
    require(params.length == args.length,
      s"${target.clazz}.$method expects ${params.length} args, got ${args.length}")
    Invoke(requestId, 0L, target, method, EntryBlock, params.map(_._1).zip(args).toMap, Nil)
  }
}
