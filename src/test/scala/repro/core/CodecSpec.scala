package repro.core

import org.scalacheck.{Gen, Prop}
import repro.{PropSupport, SparkSpec}

/** Wire codec for entity-language values, environments, and events. */
class CodecSpec extends SparkSpec with PropSupport {
  import Value._

  // ------------------------------------------------------------ generators

  val genType: Gen[EType] = {
    val leaf = Gen.oneOf[EType](EType.TInt, EType.TDouble, EType.TBool, EType.TStr,
                                EType.TUnit, EType.TRef("User"), EType.TRef("Item"))
    Gen.frequency(4 -> leaf, 1 -> leaf.map(EType.TList.apply))
  }

  def genValueOf(t: EType, depth: Int = 2): Gen[Value] = t match {
    case EType.TInt    => Gen.long.map(VInt.apply)
    case EType.TDouble => Gen.chooseNum(-1e12, 1e12).map(VDouble.apply)
    case EType.TBool   => Gen.oneOf(true, false).map(VBool.apply)
    case EType.TStr    => Gen.asciiPrintableStr.map(VStr.apply)
    case EType.TUnit   => Gen.const(VUnit)
    case EType.TRef(c) => Gen.identifier.map(k => VRef(c, k))
    case EType.TList(e) if depth > 0 =>
      Gen.listOfN(3, genValueOf(e, depth - 1)).map(xs => VList(e, xs.toVector))
    case EType.TList(e) => Gen.const(VList(e, Vector.empty))
    case EType.TInfer   => Gen.const(VUnit)
  }

  val genValue: Gen[Value] = genType.flatMap(t => genValueOf(t))

  val genEnv: Gen[Map[String, Value]] =
    Gen.mapOfN(4, Gen.zip(Gen.identifier, genValue))

  // ------------------------------------------------------------ tests

  test("scalar values round-trip") {
    val vs = List(int(0), int(-1), int(Long.MaxValue), dbl(3.25), dbl(-0.0),
                  bool(true), bool(false), str(""), str("héllo\n\"x\""), VUnit,
                  ref("User", "u-1"))
    vs.foreach(v => assert(Codec.decodeValue(Codec.encodeValue(v)) == v))
  }

  test("double NaN-free precision preserved via string encoding") {
    val v = dbl(0.1 + 0.2)
    assert(Codec.decodeValue(Codec.encodeValue(v)) == v)
  }

  test("lists carry their element type (empty list stays typed)") {
    val v = VList(EType.TRef("Item"), Vector.empty)
    val back = Codec.decodeValue(Codec.encodeValue(v))
    assert(back == v)
    assert(back.tpe == EType.TList(EType.TRef("Item")))
  }

  test("nested lists round-trip") {
    val inner = EType.TList(EType.TInt)
    val v = VList(inner, Vector(VList(EType.TInt, Vector(int(1), int(2))),
                                VList(EType.TInt, Vector.empty)))
    assert(Codec.decodeValue(Codec.encodeValue(v)) == v)
  }

  test("environment encoding is canonical (sorted keys)") {
    val e1 = Map("b" -> int(2), "a" -> int(1))
    val e2 = Map("a" -> int(1), "b" -> int(2))
    assert(Codec.encodeEnv(e1) == Codec.encodeEnv(e2))
  }

  test("environment round-trips") {
    val env = Map("x" -> int(5), "items" -> list(EType.TRef("Item"), ref("Item", "a")),
                  "ok" -> bool(true))
    assert(Codec.decodeEnv(Codec.encodeEnv(env)) == env)
  }

  test("types round-trip") {
    val ts = List(EType.TInt, EType.TDouble, EType.TBool, EType.TStr, EType.TUnit,
                  EType.TRef("X"), EType.TList(EType.TList(EType.TRef("Y"))), EType.TInfer)
    ts.foreach(t => assert(Codec.typeFromJson(Codec.typeToJson(t)) == t))
  }

  test("property: arbitrary values round-trip") {
    checkProp(Prop.forAll(genValue) { v => Codec.decodeValue(Codec.encodeValue(v)) == v })
  }

  test("property: arbitrary environments round-trip") {
    checkProp(Prop.forAll(genEnv) { e => Codec.decodeEnv(Codec.encodeEnv(e)) == e })
  }

  // ------------------------------------------------------------ events

  import Events._

  val genFrame: Gen[Frame] = for {
    c <- Gen.oneOf("User", "Item")
    k <- Gen.identifier
    m <- Gen.identifier
    b <- Gen.chooseNum(0, 20)
    e <- genEnv
    r <- Gen.identifier
  } yield Frame(EntityAddr(c, k), m, b, e, r)

  val genEvent: Gen[Event] = Gen.oneOf(
    for {
      rid <- Gen.identifier; seq <- Gen.chooseNum(0L, 100L)
      c <- Gen.oneOf("User", "Item"); k <- Gen.identifier
      m <- Gen.identifier; b <- Gen.chooseNum(-1, 20)
      env <- genEnv; stk <- Gen.listOfN(2, genFrame)
    } yield Invoke(rid, seq, EntityAddr(c, k), m, b, env, stk),
    for { rid <- Gen.identifier; v <- genValue } yield Reply(rid, v),
  )

  test("invoke event round-trips with stack and env") {
    val ev = Invoke("r1", 3, EntityAddr("User", "u1"), "checkout", -1,
      Map("item" -> ref("Item", "i9"), "amount" -> int(2)),
      List(Frame(EntityAddr("Search", "s"), "search", 4, Map("x" -> int(1)), "res")))
    assert(Events.decode(Events.encode(ev)) == ev)
  }

  test("reply event round-trips") {
    val ev = Reply("r2", list(EType.TStr, str("a"), str("b")))
    assert(Events.decode(Events.encode(ev)) == ev)
  }

  test("routing key round-trips and sorts by class first") {
    val a = EntityAddr("User", "x|y")
    // keys may not contain '|': the first separator wins, so class survives.
    assert(EntityAddr.fromRoutingKey(EntityAddr("User", "plain").routingKey) ==
      EntityAddr("User", "plain"))
  }

  test("property: arbitrary events round-trip") {
    checkProp(Prop.forAll(genEvent) { ev => Events.decode(Events.encode(ev)) == ev })
  }
}
