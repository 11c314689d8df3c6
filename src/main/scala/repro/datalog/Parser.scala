package repro.datalog

/** Hand-rolled recursive-descent parser for the paper's Datalog dialect.
  *
  * Grammar (informally):
  * {{{
  * program  ::= rule*
  * rule     ::= head ":-" body "." | head "."          // facts allowed
  * head     ::= ident "(" headTerm ("," headTerm)* ")"
  * headTerm ::= AGG "(" expr ")" | expr
  * body     ::= literal ("," literal)*
  * literal  ::= ["!" | "not" | "¬"] atom | expr cmp expr
  * atom     ::= ident "(" term ("," term)* ")"
  * term     ::= ident | number | "_"
  * expr     ::= mul (("+"|"-") mul)*
  * mul      ::= unit ("*" unit)*
  * unit     ::= ident | number | "(" expr ")"
  * cmp      ::= "=" | "!=" | "<" | "<=" | ">" | ">="
  * }}}
  * Comments run from `//` or `%` to end of line. Anonymous `_` becomes a
  * fresh variable per occurrence.
  */
object Parser {

  final case class ParseException(msg: String, pos: Int) extends RuntimeException(s"$msg (at offset $pos)")

  // ---- tokenizer -----------------------------------------------------------
  private sealed trait Tok { def pos: Int }
  private case class TIdent(s: String, pos: Int) extends Tok
  private case class TNum(v: Long, pos: Int) extends Tok
  private case class TSym(s: String, pos: Int) extends Tok
  private case class TEnd(pos: Int) extends Tok

  private def tokenize(src: String): Vector[Tok] = {
    val out = Vector.newBuilder[Tok]
    var i = 0
    val n = src.length
    while (i < n) {
      val c = src(i)
      if (c.isWhitespace) i += 1
      else if (c == '%' || (c == '/' && i + 1 < n && src(i + 1) == '/')) {
        while (i < n && src(i) != '\n') i += 1
      } else if (c == '¬') { out += TSym("!", i); i += 1 }
      else if (c.isLetter || c == '_') {
        val start = i
        while (i < n && (src(i).isLetterOrDigit || src(i) == '_')) i += 1
        out += TIdent(src.substring(start, i), start)
      } else if (c.isDigit) {
        val start = i
        while (i < n && src(i).isDigit) i += 1
        out += TNum(src.substring(start, i).toLong, start)
      } else {
        val two = if (i + 1 < n) src.substring(i, i + 2) else ""
        if (two == ":-" || two == "!=" || two == "<=" || two == ">=") { out += TSym(two, i); i += 2 }
        else if ("(),.!=<>+-*".indexOf(c) >= 0) { out += TSym(c.toString, i); i += 1 }
        else throw ParseException(s"unexpected character '$c'", i)
      }
    }
    out += TEnd(n)
    out.result()
  }

  // ---- parser state --------------------------------------------------------
  private final class P(toks: Vector[Tok]) {
    private var i = 0
    private var anonCounter = 0
    def peek: Tok = toks(i)
    def peek2: Tok = toks(math.min(i + 1, toks.length - 1))
    def next(): Tok = { val t = toks(i); i += 1; t }
    def expectSym(s: String): Unit = next() match {
      case TSym(`s`, _) => ()
      case t            => throw ParseException(s"expected '$s' but found $t", t.pos)
    }
    def freshAnon(): String = { anonCounter += 1; s"_anon$anonCounter" }

    def program(): Program = {
      val rules = Seq.newBuilder[Rule]
      while (!peek.isInstanceOf[TEnd]) rules += rule()
      Program(rules.result())
    }

    def rule(): Rule = {
      val h = head()
      peek match {
        case TSym(".", _)  => next(); Rule(h, Seq.empty)
        case TSym(":-", _) =>
          next()
          val lits = Seq.newBuilder[BodyLit]
          lits += literal()
          while (peek == TSym(",", peek.pos)) { next(); lits += literal() }
          expectSym(".")
          Rule(h, lits.result())
        case t => throw ParseException(s"expected '.' or ':-' but found $t", t.pos)
      }
    }

    def head(): Head = {
      val name = ident()
      expectSym("(")
      val terms = Seq.newBuilder[HeadTerm]
      terms += headTerm()
      while (matchesSym(",")) { next(); terms += headTerm() }
      expectSym(")")
      Head(name, terms.result())
    }

    private def matchesSym(s: String): Boolean = peek match {
      case TSym(`s`, _) => true
      case _            => false
    }

    def headTerm(): HeadTerm = peek match {
      case TIdent(s, _) if AggOp.fromName(s).isDefined && peek2 == TSym("(", peek2.pos) =>
        val op = AggOp.fromName(s).get
        next(); expectSym("(")
        val e = expr()
        expectSym(")")
        HAgg(op, e)
      case _ => HExpr(expr())
    }

    def literal(): BodyLit = peek match {
      case TSym("!", _) => next(); atom(negated = true)
      case TIdent("not", _) if peek2.isInstanceOf[TIdent] => next(); atom(negated = true)
      case TIdent(_, _) if peek2 == TSym("(", peek2.pos) =>
        // could still be a comparison like f(x) < g(y) — but functions are not
        // in the grammar, so ident "(" is always an atom.
        atom(negated = false)
      case _ =>
        val l = expr()
        val op = next() match {
          case TSym("=", _)  => CmpOp.Eq
          case TSym("!=", _) => CmpOp.Ne
          case TSym("<", _)  => CmpOp.Lt
          case TSym("<=", _) => CmpOp.Le
          case TSym(">", _)  => CmpOp.Gt
          case TSym(">=", _) => CmpOp.Ge
          case t             => throw ParseException(s"expected comparison operator but found $t", t.pos)
        }
        BCmp(op, l, expr())
    }

    def atom(negated: Boolean): BAtom = {
      val name = ident()
      expectSym("(")
      val terms = Seq.newBuilder[Term]
      terms += term()
      while (matchesSym(",")) { next(); terms += term() }
      expectSym(")")
      BAtom(name, terms.result(), negated)
    }

    def term(): Term = next() match {
      case TIdent("_", _) => Var(freshAnon())
      case TIdent(s, _)   => Var(s)
      case TNum(v, _)     => Num(v)
      case t              => throw ParseException(s"expected term but found $t", t.pos)
    }

    def expr(): Expr = {
      var e = mul()
      while (matchesSym("+") || matchesSym("-")) {
        val op = next().asInstanceOf[TSym].s
        val r = mul()
        e = if (op == "+") EAdd(e, r) else ESub(e, r)
      }
      e
    }

    def mul(): Expr = {
      var e = unit()
      while (matchesSym("*")) { next(); e = EMul(e, unit()) }
      e
    }

    def unit(): Expr = next() match {
      case TIdent("_", p) => throw ParseException("anonymous '_' not allowed in expressions", p)
      case TIdent(s, _)   => EVar(s)
      case TNum(v, _)     => ELit(v)
      case TSym("(", _)   => val e = expr(); expectSym(")"); e
      case t              => throw ParseException(s"expected expression but found $t", t.pos)
    }

    def ident(): String = next() match {
      case TIdent(s, _) => s
      case t            => throw ParseException(s"expected identifier but found $t", t.pos)
    }
  }

  /** Parse a whole Datalog program. Throws [[ParseException]] on bad input. */
  def parse(src: String): Program = new P(tokenize(src)).program()

  /** Parse a single rule (convenience for tests). */
  def parseRule(src: String): Rule = {
    val p = parse(src)
    require(p.rules.size == 1, s"expected exactly one rule, got ${p.rules.size}")
    p.rules.head
  }
}
