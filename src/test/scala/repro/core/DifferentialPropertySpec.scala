package repro.core

import org.scalacheck.{Gen, Prop}
import repro.{PropSupport, SparkSpec}
import repro.faas.FaasRuntime
import repro.runtime.LocalRuntime
import Ast._
import EType._
import Value._

/** Property-based differential testing of the whole compiler pipeline:
  * random type-correct entity programs (nested control flow with remote
  * calls in arbitrary expression positions) must behave identically under
  *
  *   direct interpretation  ≡  split dataflow (Local runtime)  ≡  FaaS
  *
  * for both return values and final entity state. This exercises ANF
  * hoisting, CFG construction, block splitting, and the distributed call
  * stack on program shapes no hand-written test covers.
  */
class DifferentialPropertySpec extends SparkSpec with PropSupport {

  /** Fixed callee entity: a counter with getters, mutation, and a bool. */
  private val calleeB = ClassDef("B", "id",
    List(FieldDef("id", TStr, str("")), FieldDef("n", TInt, int(0))),
    List(
      FunctionDef("get", Nil, TInt, List(Return(FieldGet("n")))),
      FunctionDef("add", List("x" -> TInt), TInt, List(
        SetField("n", BinOp("+", FieldGet("n"), Var("x"))),
        Return(FieldGet("n")),
      )),
      FunctionDef("flag", Nil, TBool, List(Return(BinOp(">", FieldGet("n"), Const(int(0)))))),
    ))

  // ---------------------------------------------------------- generators

  /** Int-typed expressions over declared int variables; remote calls may
    * appear in ANY position (hoisting must fix them up). */
  private def genIntExpr(vars: List[String], depth: Int): Gen[Expr] = {
    val leaf = Gen.oneOf(
      Gen.chooseNum(-20L, 20L).map(v => Const(int(v))),
      Gen.const(FieldGet("acc")),
      if (vars.nonEmpty) Gen.oneOf(vars).map(Var.apply) else Gen.const(FieldGet("acc")),
    )
    if (depth <= 0) leaf
    else Gen.frequency(
      3 -> leaf,
      2 -> (for {
        op <- Gen.oneOf("+", "-", "*")
        l <- genIntExpr(vars, depth - 1)
        r <- genIntExpr(vars, depth - 1)
      } yield BinOp(op, l, r)),
      1 -> Gen.const(RemoteCall(Var("b"), "get", Nil)),
      1 -> genIntExpr(vars, depth - 1).map(e => RemoteCall(Var("b"), "add", List(e))),
      1 -> genIntExpr(vars, depth - 1).map(Neg.apply),
    )
  }

  private def genBoolExpr(vars: List[String], depth: Int): Gen[Expr] = {
    val cmp = for {
      op <- Gen.oneOf("<", "<=", ">", ">=", "==", "!=")
      l <- genIntExpr(vars, depth - 1)
      r <- genIntExpr(vars, depth - 1)
    } yield BinOp(op, l, r)
    if (depth <= 0) cmp
    else Gen.frequency(
      3 -> cmp,
      1 -> Gen.const(RemoteCall(Var("b"), "flag", Nil)),
      1 -> (for {
        op <- Gen.oneOf("and", "or")
        l <- genBoolExpr(vars, depth - 1)
        r <- genBoolExpr(vars, depth - 1)
      } yield BinOp(op, l, r)),
      1 -> genBoolExpr(vars, depth - 1).map(Not.apply),
    )
  }

  /** Statement lists; tracks declared variables. While loops are excluded
    * (termination), covered by directed tests. */
  private def genStmts(vars: List[String], depth: Int, fresh: Int): Gen[(List[Stmt], List[String])] =
    if (depth <= 0) Gen.const((Nil, vars))
    else Gen.frequency(
      2 -> (for {
        e <- genIntExpr(vars, 2)
        rest <- genStmts(s"v$fresh" :: vars, depth - 1, fresh + 1)
      } yield (Assign(s"v$fresh", TInt, e) :: rest._1, rest._2)),
      1 -> (for {
        e <- genIntExpr(vars, 2)
        rest <- genStmts(vars, depth - 1, fresh)
        stmt <- if (vars.nonEmpty) Gen.oneOf(vars).map(v => SetVar(v, e))
                else Gen.const(SetField("acc", e))
      } yield (stmt :: rest._1, rest._2)),
      1 -> (for {
        e <- genIntExpr(vars, 2)
        rest <- genStmts(vars, depth - 1, fresh)
      } yield (SetField("acc", e) :: rest._1, rest._2)),
      1 -> (for {
        c <- genBoolExpr(vars, 1)
        t <- genStmts(vars, depth - 1, fresh + 10)
        e <- genStmts(vars, depth - 1, fresh + 20)
        rest <- genStmts(vars, depth - 1, fresh + 30)
      } yield (If(c, t._1, e._1) :: rest._1, rest._2)),
      1 -> (for {
        n <- Gen.chooseNum(0L, 3L)
        body <- genStmts(s"i$fresh" :: vars, depth - 1, fresh + 40)
        rest <- genStmts(vars, depth - 1, fresh + 50)
      } yield (ForEach(s"i$fresh", TInt, Builtin("range", List(Const(int(n)))), body._1)
                 :: rest._1, rest._2)),
    )

  private val genProgram: Gen[Program] = for {
    (body, vars) <- genStmts(List("x"), 4, 0)
    ret <- genIntExpr(vars, 2)
  } yield Program(List(
    ClassDef("A", "id",
      List(FieldDef("id", TStr, str("")), FieldDef("acc", TInt, int(0))),
      List(FunctionDef("m", List("b" -> TRef("B"), "x" -> TInt), TInt, body :+ Return(ret)))),
    calleeB,
  ))

  // -------------------------------------------------------------- checks

  private def runAll(p: Program, arg: Long): Prop = {
    TypeChecker.check(p) match {
      case Left(errs) => throw new IllegalStateException(s"generator produced ill-typed program: $errs")
      case Right(_)   => ()
    }
    val graph = Compiler.compile(p)
    val interp = new Interpreter(p)
    val local = new LocalRuntime(graph)
    val faas = new FaasRuntime(graph)
    interp.seed("B", "b1", Map("n" -> int(5)))
    local.seed("B", "b1", Map("n" -> int(5)))
    faas.seed("B", "b1", Map("n" -> int(5)))
    val args = List(ref("B", "b1"), int(arg))
    val e = interp.invoke("A", "a1", "m", args)
    val l = local.invoke("A", "a1", "m", args)
    val f = faas.invoke("A", "a1", "m", args)
    val stateOk =
      interp.snapshot("B", "b1") == local.snapshot("B", "b1") &&
      interp.snapshot("B", "b1") == faas.snapshot("B", "b1") &&
      interp.snapshot("A", "a1") == local.snapshot("A", "a1") &&
      interp.snapshot("A", "a1") == faas.snapshot("A", "a1")
    Prop(e == l && e == f && stateOk) :| s"interp=$e local=$l faas=$f stateOk=$stateOk"
  }

  test("property: random programs — interpreter ≡ local dataflow ≡ faas (results and state)") {
    checkProp(Prop.forAll(genProgram, Gen.chooseNum(-10L, 10L)) { (p, x) => runAll(p, x) },
      minSuccessful = 120)
  }

  test("property: generated programs always type-check") {
    checkProp(Prop.forAll(genProgram) { p => TypeChecker.check(p).isRight })
  }

  test("property: split machines of generated programs validate structurally") {
    checkProp(Prop.forAll(genProgram) { p =>
      Compiler.compile(p).splitMethods.foreach(_.validate())
      true
    })
  }

  test("property: normalization preserves the remote-call-free invariant") {
    checkProp(Prop.forAll(genProgram) { p =>
      Anf.normalize(p).classes.forall(_.methods.forall(Anf.isNormalized))
    })
  }
}
