package repro.core

/** Runtime values of the entity language.
  *
  * Every value is immutable and serializable (Codec) — a hard requirement of
  * the programming model (§2.1): values travel inside events across runtime
  * hops and are persisted as operator state.
  */
sealed trait Value {
  /** The static type of this value. */
  def tpe: EType = this match {
    case Value.VInt(_)       => EType.TInt
    case Value.VDouble(_)    => EType.TDouble
    case Value.VBool(_)      => EType.TBool
    case Value.VStr(_)       => EType.TStr
    case Value.VUnit         => EType.TUnit
    case Value.VList(t, _)   => EType.TList(t)
    case Value.VRef(c, _)    => EType.TRef(c)
  }

  /** Python-ish truthiness is not used: only VBool may appear in conditions
    * (enforced by the TypeChecker); this accessor throws on anything else. */
  def asBool: Boolean = this match {
    case Value.VBool(b) => b
    case other          => throw new IllegalStateException(s"expected bool, got $other")
  }

  def asInt: Long = this match {
    case Value.VInt(i) => i
    case other         => throw new IllegalStateException(s"expected int, got $other")
  }

  def asDouble: Double = this match {
    case Value.VDouble(d) => d
    case Value.VInt(i)    => i.toDouble
    case other            => throw new IllegalStateException(s"expected float, got $other")
  }

  def asStr: String = this match {
    case Value.VStr(s) => s
    case other         => throw new IllegalStateException(s"expected str, got $other")
  }

  def asList: Vector[Value] = this match {
    case Value.VList(_, xs) => xs
    case other              => throw new IllegalStateException(s"expected list, got $other")
  }

  def asRef: Value.VRef = this match {
    case r: Value.VRef => r
    case other         => throw new IllegalStateException(s"expected entity ref, got $other")
  }
}

object Value {
  final case class VInt(v: Long) extends Value
  final case class VDouble(v: Double) extends Value
  final case class VBool(v: Boolean) extends Value
  final case class VStr(v: String) extends Value
  case object VUnit extends Value
  /** Homogeneous immutable list; carries its element type so empty lists
    * stay typeable after a serialization round trip. */
  final case class VList(elem: EType, items: Vector[Value]) extends Value
  /** A reference to the stateful entity of class `clazz` keyed by `key`.
    * This is what makes a call remote: invoking a method on a VRef routes an
    * event to that entity's operator partition. */
  final case class VRef(clazz: String, key: String) extends Value

  /** Convenience constructors used throughout tests and entity programs. */
  def int(v: Long): Value              = VInt(v)
  def dbl(v: Double): Value            = VDouble(v)
  def bool(v: Boolean): Value          = VBool(v)
  def str(v: String): Value            = VStr(v)
  def list(elem: EType, vs: Value*): Value = VList(elem, vs.toVector)
  def ref(clazz: String, key: String): Value = VRef(clazz, key)

  /** Default value used to initialize an entity field of type `t` when no
    * explicit default is declared. */
  def default(t: EType): Value = t match {
    case EType.TInt      => VInt(0)
    case EType.TDouble   => VDouble(0.0)
    case EType.TBool     => VBool(false)
    case EType.TStr      => VStr("")
    case EType.TUnit     => VUnit
    case EType.TList(e)  => VList(e, Vector.empty)
    case EType.TRef(c)   => VRef(c, "")
    case EType.TInfer    => VUnit
  }
}
