package repro.core

import Ast._

/** Unparser: renders a stateful-entity program in the paper's input
  * language — annotated, type-hinted Python (Listing 1's style).
  *
  * Two uses: (1) the LOC experiment counts the *programmer-facing* source,
  * exactly as the paper counts its Python programs (counting the Scala AST
  * constructors would measure our IR encoding, not the programming model);
  * (2) debugging — a compiled dataflow can be printed back as the program
  * the developer wrote.
  */
object PyPrinter {

  def render(p: Program): String =
    p.classes.map(render).mkString("\n\n")

  def render(cd: ClassDef): String = {
    val sb = new StringBuilder
    sb ++= "@stateflow\n"
    sb ++= s"class ${cd.name}:\n"
    sb ++= s"    def __init__(self):\n"
    cd.fields.foreach { f =>
      sb ++= s"        self.${f.name}: ${f.tpe.render} = ${value(f.init)}\n"
    }
    sb ++= "\n"
    sb ++= s"    def __key__(self):\n        return self.${cd.keyField}\n"
    cd.methods.foreach { m =>
      sb ++= "\n"
      val params = ("self" :: m.params.map { case (n, t) => s"$n: ${t.render}" }).mkString(", ")
      sb ++= s"    def ${m.name}($params) -> ${m.returnType.render}:\n"
      if (m.body.isEmpty) sb ++= "        pass\n"
      else m.body.foreach(s => stmt(sb, s, 2))
    }
    sb.toString
  }

  private def indent(sb: StringBuilder, level: Int): Unit = sb ++= "    " * level

  private def stmt(sb: StringBuilder, s: Stmt, level: Int): Unit = s match {
    case Assign(n, t, v) =>
      indent(sb, level)
      val ann = if (t == EType.TInfer) "" else s": ${t.render}"
      sb ++= s"$n$ann = ${expr(v)}\n"
    case SetVar(n, v)   => indent(sb, level); sb ++= s"$n = ${expr(v)}\n"
    case SetField(n, v) => indent(sb, level); sb ++= s"self.$n = ${expr(v)}\n"
    case ExprStmt(e)    => indent(sb, level); sb ++= s"${expr(e)}\n"
    case Return(v)      => indent(sb, level); sb ++= s"return ${expr(v)}\n"
    case If(c, t, e) =>
      indent(sb, level); sb ++= s"if ${expr(c)}:\n"
      if (t.isEmpty) { indent(sb, level + 1); sb ++= "pass\n" }
      t.foreach(stmt(sb, _, level + 1))
      if (e.nonEmpty) {
        indent(sb, level); sb ++= "else:\n"
        e.foreach(stmt(sb, _, level + 1))
      }
    case ForEach(n, _, it, body) =>
      indent(sb, level); sb ++= s"for $n in ${expr(it)}:\n"
      if (body.isEmpty) { indent(sb, level + 1); sb ++= "pass\n" }
      body.foreach(stmt(sb, _, level + 1))
    case While(c, body) =>
      indent(sb, level); sb ++= s"while ${expr(c)}:\n"
      if (body.isEmpty) { indent(sb, level + 1); sb ++= "pass\n" }
      body.foreach(stmt(sb, _, level + 1))
  }

  def expr(e: Expr): String = e match {
    case Const(v)        => value(v)
    case Var(n)          => n
    case FieldGet(n)     => s"self.$n"
    case Not(x)          => s"not ${atom(x)}"
    case Neg(x)          => s"-${atom(x)}"
    case BinOp(op, l, r) => s"${atom(l)} $op ${atom(r)}"
    case MakeList(_, items) => items.map(expr).mkString("[", ", ", "]")
    case Builtin("ref", Const(Value.VStr(c)) :: k :: Nil) => s"$c[${expr(k)}]"
    case Builtin(n, args) => s"$n(${args.map(expr).mkString(", ")})"
    case RemoteCall(t, m, args) => s"${atom(t)}.$m(${args.map(expr).mkString(", ")})"
    case SelfCall(m, args)      => s"self.$m(${args.map(expr).mkString(", ")})"
  }

  private def atom(e: Expr): String = e match {
    case _: BinOp | _: Not | _: Neg => s"(${expr(e)})"
    case _                          => expr(e)
  }

  def value(v: Value): String = v match {
    case Value.VInt(i)      => i.toString
    case Value.VDouble(d)   => d.toString
    case Value.VBool(b)     => if (b) "True" else "False"
    case Value.VStr(s)      => "\"" + s.replace("\\", "\\\\").replace("\"", "\\\"") + "\""
    case Value.VUnit        => "None"
    case Value.VList(_, xs) => xs.map(value).mkString("[", ", ", "]")
    case Value.VRef(c, k)   => s"""$c["$k"]"""
  }

  /** Non-blank source lines of the rendered program (the LOC metric). */
  def locOf(p: Program): Int =
    render(p).linesIterator.count(_.trim.nonEmpty)
}
