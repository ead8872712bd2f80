package repro.core

import repro.SparkSpec
import repro.examples.Shop
import Ast._
import EType._
import Value._

/** The static pass of §2.1: declared types, remote-call discovery, key
  * rules, self-call restrictions. */
class TypeCheckerSpec extends SparkSpec {

  private def cls(name: String, methods: List[FunctionDef],
                  fields: List[FieldDef] = Nil, key: String = "id"): ClassDef =
    ClassDef(name, key, FieldDef("id", TStr, str("")) :: fields, methods)

  private def errorsOf(p: Program): List[String] =
    TypeChecker.check(p).left.getOrElse(Nil).map(_.toString)

  test("the paper's Listing 1 program type-checks") {
    val info = TypeChecker.checkOrThrow(Shop.program)
    assert(info.remoteFree.contains(("Item", "enough_stock")))
    assert(info.remoteFree.contains(("Item", "remove_stock")))
    assert(!info.remoteFree.contains(("User", "add_to_basket")))
    assert(!info.remoteFree.contains(("User", "buy_item")))
  }

  test("remote-call counts discovered through type annotations") {
    val info = TypeChecker.checkOrThrow(Shop.program)
    assert(info.methodRemoteCallCount(("User", "buy_item")) == 1)
    assert(info.methodRemoteCallCount(("User", "add_to_basket")) == 2)
    assert(info.methodRemoteCallCount(("Item", "get_price")) == 0)
  }

  test("call edges form the function call graph of §2.2") {
    val info = TypeChecker.checkOrThrow(Shop.program)
    assert(info.callEdges.contains(("User", "buy_item", "Item", "remove_stock")))
    assert(info.callEdges.contains(("User", "add_to_basket", "Item", "enough_stock")))
    assert(info.callEdges.contains(("User", "add_to_basket", "Item", "get_price")))
  }

  test("key field must exist") {
    val p = Program(List(ClassDef("A", "nope", List(FieldDef("id", TStr, str(""))), Nil)))
    assert(errorsOf(p).exists(_.contains("key field nope")))
  }

  test("key field must be a string (it partitions the operator)") {
    val p = Program(List(ClassDef("A", "id", List(FieldDef("id", TInt, int(0))), Nil)))
    assert(errorsOf(p).exists(_.contains("must be str")))
  }

  test("key field cannot be re-assigned (stricter than the paper's footnote 2)") {
    val p = Program(List(cls("A", List(
      FunctionDef("evil", Nil, TUnit, List(SetField("id", Const(str("new"))))),
    ))))
    assert(errorsOf(p).exists(_.contains("cannot change")))
  }

  test("use of undeclared variable is an error") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TInt, List(Return(Var("ghost")))),
    ))))
    assert(errorsOf(p).exists(_.contains("undeclared variable ghost")))
  }

  test("assignment to undeclared variable is an error") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TUnit, List(SetVar("x", Const(int(1))))),
    ))))
    assert(errorsOf(p).exists(_.contains("undeclared variable x")))
  }

  test("declared type must match assigned expression") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TUnit, List(Assign("x", TInt, Const(str("s"))))),
    ))))
    assert(errorsOf(p).exists(_.contains("declared int but assigned str")))
  }

  test("int widens to float") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TUnit, List(Assign("x", TDouble, Const(int(1))))),
    ))))
    assert(TypeChecker.check(p).isRight)
  }

  test("if condition must be bool") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TUnit, List(If(Const(int(1)), Nil, Nil))),
    ))))
    assert(errorsOf(p).exists(_.contains("if condition")))
  }

  test("for requires a list") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TUnit, List(ForEach("i", TInt, Const(int(3)), Nil))),
    ))))
    assert(errorsOf(p).exists(_.contains("non-list")))
  }

  test("return type checked against declaration") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TInt, List(Return(Const(bool(true))))),
    ))))
    assert(errorsOf(p).exists(_.contains("return bool, declared int")))
  }

  test("remote call on unknown class rejected") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", List("x" -> TRef("Ghost")), TUnit, List(
        ExprStmt(RemoteCall(Var("x"), "m2", Nil)),
      )),
    ))))
    assert(errorsOf(p).exists(_.contains("unknown class Ghost")))
  }

  test("remote call to missing method rejected") {
    val p = Program(List(
      cls("A", List(FunctionDef("m", List("b" -> TRef("B")), TUnit, List(
        ExprStmt(RemoteCall(Var("b"), "nope", Nil)))))),
      cls("B", Nil),
    ))
    assert(errorsOf(p).exists(_.contains("has no method nope")))
  }

  test("remote call arity and argument types checked") {
    val p = Program(List(
      cls("A", List(FunctionDef("m", List("b" -> TRef("B")), TUnit, List(
        ExprStmt(RemoteCall(Var("b"), "f", List(Const(str("x"))))))))),
      cls("B", List(FunctionDef("f", List("n" -> TInt), TUnit, Nil))),
    ))
    assert(errorsOf(p).exists(_.contains("expected int, got str")))
  }

  test("method call on non-entity type rejected") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", List("x" -> TInt), TUnit, List(
        ExprStmt(RemoteCall(Var("x"), "f", Nil)))),
    ))))
    assert(errorsOf(p).exists(_.contains("non-entity type")))
  }

  test("self-calls must target remote-free methods") {
    val p = Program(List(
      cls("A", List(
        FunctionDef("outer", Nil, TUnit, List(ExprStmt(SelfCall("inner", Nil)))),
        FunctionDef("inner", List(), TUnit, List(
          Assign("b", TRef("B"), Builtin("ref", List(Const(str("B")), Const(str("1"))))),
          ExprStmt(RemoteCall(Var("b"), "f", Nil)),
        )),
      )),
      cls("B", List(FunctionDef("f", Nil, TUnit, Nil))),
    ))
    assert(errorsOf(p).exists(_.contains("self-calls must be remote-free")))
  }

  test("transitive self-call remote-freedom (fixpoint)") {
    // a -> b -> c where c makes a remote call: neither a nor b is remote-free.
    val p = Program(List(
      cls("A", List(
        FunctionDef("a", Nil, TUnit, List(ExprStmt(SelfCall("b", Nil)))),
        FunctionDef("b", Nil, TUnit, List(ExprStmt(SelfCall("c", Nil)))),
        FunctionDef("c", Nil, TUnit, List(
          Assign("x", TRef("B"), Builtin("ref", List(Const(str("B")), Const(str("1"))))),
          ExprStmt(RemoteCall(Var("x"), "f", Nil)),
        )),
      )),
      cls("B", List(FunctionDef("f", Nil, TUnit, Nil))),
    ))
    TypeChecker.check(p) match {
      case Left(errs) =>
        // a and b self-call non-remote-free methods: both flagged.
        assert(errs.exists(_.toString.contains("A.a")))
        assert(errs.exists(_.toString.contains("A.b")))
      case Right(_) => fail("expected self-call errors")
    }
  }

  test("ref builtin requires a literal known class") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TUnit, List(
        Assign("x", TRef("Nope"), Builtin("ref", List(Const(str("Nope")), Const(str("1"))))),
      )),
    ))))
    assert(errorsOf(p).exists(_.contains("unknown class Nope")))
  }

  test("duplicate class and method names rejected") {
    val p1 = Program(List(cls("A", Nil), cls("A", Nil)))
    assert(errorsOf(p1).exists(_.contains("duplicate class")))
    val p2 = Program(List(cls("A", List(
      FunctionDef("m", Nil, TUnit, Nil), FunctionDef("m", Nil, TUnit, Nil)))))
    assert(errorsOf(p2).exists(_.contains("duplicate method")))
  }

  test("field default must match declared type") {
    val p = Program(List(ClassDef("A", "id",
      List(FieldDef("id", TStr, str("")), FieldDef("n", TInt, str("oops"))), Nil)))
    assert(errorsOf(p).exists(_.contains("default is str")))
  }

  test("checkOrThrow throws with all diagnostics") {
    val p = Program(List(cls("A", List(
      FunctionDef("m", Nil, TInt, List(Return(Var("ghost")))),
    ))))
    val e = intercept[IllegalArgumentException](TypeChecker.checkOrThrow(p))
    assert(e.getMessage.contains("ghost"))
  }
}
