package repro.core

import repro.SparkSpec
import repro.examples.Shop
import Ast._
import EType._
import Value._
import StateMachine._

/** The function-splitting algorithm (§2.3): block structure, paper
  * examples, and parameter/return-variable analysis. */
class SplitterSpec extends SparkSpec {

  private def split(fd: FunctionDef, clazz: String = "User"): SplitFunction =
    Splitter.split(clazz, Anf.normalize(fd))

  test("the paper's buy_item splits into exactly two function blocks") {
    val sm = split(Shop.user.method("buy_item"))
    assert(sm.size == 2, s"expected the paper's 2-way split, got ${sm.blocks}")
    val b0 = sm.block(sm.entry)
    // buy_item_0 evaluates the arguments of the remote call...
    val call = b0.term match {
      case c: CallTerm => c
      case other       => fail(s"entry block should suspend at remove_stock, got $other")
    }
    assert(call.method == "remove_stock")
    assert(call.resultVar == "is_removed")
    // ...and defines total_price, which the paper says it returns.
    assert(b0.defines.contains("total_price"))
    // buy_item_1 uses total_price, so it takes it as a parameter.
    val b1 = sm.block(call.cont)
    assert(b1.params == Set("total_price"))
    assert(b1.term == Ret(Var("total_price")))
  }

  test("buy_item_0 parameters are the original function's used variables") {
    val sm = split(Shop.user.method("buy_item"))
    assert(sm.block(sm.entry).params == Set("amount", "price", "item"))
  }

  test("add_to_basket splits at the loop and both remote calls (Fig. 2)") {
    val sm = split(Shop.user.method("add_to_basket"))
    sm.validate()
    // Two suspension points: enough_stock and get_price.
    assert(sm.callSites.map(_.method).toSet == Set("enough_stock", "get_price"))
    // Loop head: a condition block that can reach both a call site and the
    // post-loop balance check.
    assert(sm.size >= 5, s"expected a Fig.2-like machine, got ${sm.size} blocks")
    // The machine has a cycle (the for-loop) — some block's successors
    // include an earlier block.
    val hasBackEdge = sm.blocks.values.exists(b => b.term.targets.exists(_ <= b.id))
    assert(hasBackEdge, "for-loop must produce a cycle in the state machine")
  }

  test("remote-free method with control flow is NOT split (inline per §2.3)") {
    val graph = Compiler.compile(Shop.program)
    assert(graph.operator("Item").method("remove_stock").isInstanceOf[InlineMethod])
    assert(graph.operator("Item").method("get_price").isInstanceOf[InlineMethod])
    assert(graph.operator("User").method("add_to_basket").isInstanceOf[SplitMethod])
    assert(graph.operator("User").method("checkout").isInstanceOf[SplitMethod])
  }

  test("if with remote calls in both branches") {
    val b = TRef("B")
    val fd = FunctionDef("m", List("x" -> b, "go" -> TBool), TInt, List(
      If(Var("go"),
        List(Return(RemoteCall(Var("x"), "get", Nil))),
        List(Return(BinOp("+", RemoteCall(Var("x"), "get", Nil), Const(int(1)))))),
    ))
    val sm = split(fd, "A")
    sm.validate()
    assert(sm.callSites.length == 2)
    sm.block(sm.entry).term match {
      case CondBr(Var("go"), _, _) => ()
      case other                   => fail(s"entry should branch on go: $other")
    }
  }

  test("no remote calls inside any block's straight-line statements") {
    for (m <- List("add_to_basket", "buy_item", "checkout")) {
      val sm = split(Shop.user.method(m))
      sm.blocks.values.foreach { blk =>
        blk.stmts.foreach(s => assert(stmtExprs(s).forall(e => !hasRemote(e))))
      }
    }
  }

  test("every block reachable from entry (cleanup pruned the rest)") {
    val sm = split(Shop.user.method("add_to_basket"))
    val seen = scala.collection.mutable.Set(sm.entry)
    var frontier = List(sm.entry)
    while (frontier.nonEmpty) {
      frontier = frontier.flatMap(id => sm.block(id).term.targets).filterNot(seen)
      seen ++= frontier
    }
    assert(seen == sm.blocks.keySet)
  }

  test("block ids are contiguous from 0 after renumbering") {
    val sm = split(Shop.user.method("add_to_basket"))
    assert(sm.blocks.keySet == (0 until sm.size).toSet)
    assert(sm.entry == 0)
  }

  test("splitter rejects non-normalized input") {
    val fd = FunctionDef("m", List("x" -> TRef("Item")), TInt, List(
      Return(BinOp("+", Const(int(1)), RemoteCall(Var("x"), "get_price", Nil))),
    ))
    intercept[IllegalArgumentException](Splitter.split("User", fd))
  }

  test("implicit return: function without trailing return gets unit exit") {
    val fd = FunctionDef("m", List("x" -> TRef("Item")), TUnit, List(
      ExprStmt(RemoteCall(Var("x"), "get_price", Nil)),
    ))
    val sm = split(fd)
    val exitBlocks = sm.blocks.values.collect { case Block(_, _, Ret(v)) => v }
    assert(exitBlocks.toList == List(Const(VUnit)))
  }

  test("while loop with remote call in body") {
    val fd = FunctionDef("m", List("x" -> TRef("Item"), "n" -> TInt), TInt, List(
      Assign("i", TInt, Const(int(0))),
      Assign("sum", TInt, Const(int(0))),
      While(BinOp("<", Var("i"), Var("n")), List(
        Assign("p", TInt, RemoteCall(Var("x"), "get_price", Nil)),
        SetVar("sum", BinOp("+", Var("sum"), Var("p"))),
        SetVar("i", BinOp("+", Var("i"), Const(int(1)))),
      )),
      Return(Var("sum")),
    ))
    val sm = split(fd)
    sm.validate()
    assert(sm.callSites.length == 1)
    val hasBackEdge = sm.blocks.values.exists(b => b.term.targets.exists(_ <= b.id))
    assert(hasBackEdge)
  }

  test("nested loops with remote calls validate") {
    val fd = FunctionDef("m", List("xs" -> TList(TRef("Item"))), TInt, List(
      Assign("total", TInt, Const(int(0))),
      ForEach("a", TRef("Item"), Var("xs"), List(
        ForEach("b", TRef("Item"), Var("xs"), List(
          Assign("p", TInt, RemoteCall(Var("b"), "get_price", Nil)),
          SetVar("total", BinOp("+", Var("total"), Var("p"))),
        )),
      )),
      Return(Var("total")),
    ))
    val sm = split(fd)
    sm.validate()
    assert(sm.callSites.length == 1)
  }

  test("call sites record receiver expression and arguments") {
    val sm = split(Shop.user.method("checkout"))
    val calls = sm.callSites
    assert(calls.map(_.method) == List("get_price", "remove_stock"))
    calls.foreach(c => assert(!hasRemote(c.target) && c.args.forall(a => !hasRemote(a))))
  }

  test("defines includes the call result variable") {
    val sm = split(Shop.user.method("buy_item"))
    assert(sm.block(sm.entry).defines.contains("is_removed"))
  }

  test("deterministic: splitting twice yields identical machines") {
    val a = split(Shop.user.method("add_to_basket"))
    val b = split(Shop.user.method("add_to_basket"))
    assert(a == b)
  }
}
