package repro.datalog

import org.scalatest.funsuite.AnyFunSuite

class ParserSpec extends AnyFunSuite {

  test("parses a single linear rule") {
    val r = Parser.parseRule("tc(x, y) :- arc(x, y).")
    assert(r.head == Head("tc", Seq(HExpr(EVar("x")), HExpr(EVar("y")))))
    assert(r.body == Seq(BAtom("arc", Seq(Var("x"), Var("y")))))
  }

  test("parses a recursive rule with two atoms") {
    val r = Parser.parseRule("tc(x, y) :- tc(x, z), arc(z, y).")
    assert(r.positiveAtoms.map(_.pred) == Seq("tc", "arc"))
  }

  test("parses the full TC program") {
    val p = Parser.parse("tc(x,y) :- arc(x,y). tc(x,y) :- tc(x,z), arc(z,y).")
    assert(p.rules.size == 2)
    assert(p.idbPreds == Set("tc"))
    assert(p.edbPreds == Set("arc"))
  }

  test("parses negation with bang") {
    val r = Parser.parseRule("ntc(x,y) :- node(x), node(y), !tc(x,y).")
    assert(r.negatedAtoms == Seq(BAtom("tc", Seq(Var("x"), Var("y")), negated = true)))
    assert(r.positiveAtoms.size == 2)
  }

  test("parses negation with 'not' keyword") {
    val r = Parser.parseRule("a(x) :- b(x), not c(x).")
    assert(r.negatedAtoms == Seq(BAtom("c", Seq(Var("x")), negated = true)))
  }

  test("parses inequality comparison") {
    val r = Parser.parseRule("sg(x,y) :- arc(p,x), arc(p,y), x != y.")
    assert(r.comparisons == Seq(BCmp(CmpOp.Ne, EVar("x"), EVar("y"))))
  }

  test("parses all comparison operators") {
    for ((sym, op) <- Seq("=" -> CmpOp.Eq, "!=" -> CmpOp.Ne, "<" -> CmpOp.Lt,
                          "<=" -> CmpOp.Le, ">" -> CmpOp.Gt, ">=" -> CmpOp.Ge)) {
      val r = Parser.parseRule(s"a(x,y) :- b(x,y), x $sym y.")
      assert(r.comparisons.head.op == op, s"for symbol $sym")
    }
  }

  test("parses MIN aggregation in head") {
    val r = Parser.parseRule("cc3(x, MIN(x)) :- arc(x, y).")
    assert(r.head.terms(1) == HAgg(AggOp.Min, EVar("x")))
  }

  test("parses every aggregation operator") {
    for (op <- AggOp.all) {
      val r = Parser.parseRule(s"a(x, ${op.name}(y)) :- b(x, y).")
      assert(r.head.terms(1) == HAgg(op, EVar("y")))
    }
  }

  test("aggregation operator names are case-insensitive") {
    val r = Parser.parseRule("a(x, min(y)) :- b(x, y).")
    assert(r.head.terms(1) == HAgg(AggOp.Min, EVar("y")))
  }

  test("parses arithmetic in aggregate argument") {
    val r = Parser.parseRule("sssp2(y, MIN(d1 + d2)) :- sssp2(x, d1), arc(x, y, d2).")
    assert(r.head.terms(1) == HAgg(AggOp.Min, EAdd(EVar("d1"), EVar("d2"))))
  }

  test("parses constant aggregate argument MIN(0)") {
    val r = Parser.parseRule("sssp2(y, MIN(0)) :- id(y).")
    assert(r.head.terms(1) == HAgg(AggOp.Min, ELit(0)))
  }

  test("parses subtraction and multiplication with precedence") {
    val r = Parser.parseRule("a(x, MIN(x + y * z - 2)) :- b(x, y, z).")
    assert(r.head.terms(1) ==
      HAgg(AggOp.Min, ESub(EAdd(EVar("x"), EMul(EVar("y"), EVar("z"))), ELit(2))))
  }

  test("parses parenthesized expressions") {
    val r = Parser.parseRule("a(x, MIN((x + y) * 2)) :- b(x, y).")
    assert(r.head.terms(1) == HAgg(AggOp.Min, EMul(EAdd(EVar("x"), EVar("y")), ELit(2))))
  }

  test("anonymous underscore becomes fresh variables") {
    val r = Parser.parseRule("cc(x) :- arc(x, _), arc(_, x).")
    val anons = r.positiveAtoms.flatMap(_.terms).collect { case Var(n) if n.startsWith("_anon") => n }
    assert(anons.size == 2)
    assert(anons.distinct.size == 2, "each _ must be a distinct variable")
  }

  test("parses numeric constants in body atoms") {
    val r = Parser.parseRule("a(x) :- b(x, 42).")
    assert(r.positiveAtoms.head.terms(1) == Num(42))
  }

  test("parses ground facts") {
    val p = Parser.parse("edge(1, 2). edge(2, 3).")
    assert(p.rules.size == 2)
    assert(p.rules.head.body.isEmpty)
    assert(p.rules.head.head.terms == Seq(HExpr(ELit(1)), HExpr(ELit(2))))
  }

  test("skips // and % comments") {
    val p = Parser.parse(
      """// a comment
        |tc(x,y) :- arc(x,y). % trailing comment
        |% whole-line comment
        |tc(x,y) :- tc(x,z), arc(z,y).
        |""".stripMargin)
    assert(p.rules.size == 2)
  }

  test("parses the unicode negation sign") {
    val r = Parser.parseRule("a(x) :- b(x), ¬c(x).")
    assert(r.negatedAtoms.map(_.pred) == Seq("c"))
  }

  test("parses all eight benchmark programs") {
    import repro.programs.Programs._
    assert(tc.rules.size == 2)
    assert(sg.rules.size == 2)
    assert(reach.rules.size == 2)
    assert(cc.rules.size == 4)
    assert(sssp.rules.size == 3)
    assert(andersen.rules.size == 4)
    assert(cspa.rules.size == 10)
    assert(csda.rules.size == 2)
  }

  test("rejects unterminated rule") {
    assertThrows[Parser.ParseException](Parser.parse("tc(x,y) :- arc(x,y)"))
  }

  test("rejects missing parenthesis") {
    assertThrows[Parser.ParseException](Parser.parse("tc(x,y :- arc(x,y)."))
  }

  test("rejects garbage characters") {
    assertThrows[Parser.ParseException](Parser.parse("tc(x,y) :- arc(x,y) & foo(x)."))
  }

  test("rejects empty head") {
    assertThrows[Parser.ParseException](Parser.parse("() :- arc(x,y)."))
  }

  test("rejects anonymous variable in comparison") {
    assertThrows[Parser.ParseException](Parser.parse("a(x) :- b(x), x < _."))
  }

  test("round-trips through toString") {
    val src = "sg(x, y) :- arc(p, x), arc(p, y), x != y."
    val r = Parser.parseRule(src)
    assert(Parser.parseRule(r.toString) == r)
  }

  test("round-trips negation and aggregation through toString") {
    val r1 = Parser.parseRule("ntc(x,y) :- node(x), node(y), !tc(x,y).")
    assert(Parser.parseRule(r1.toString) == r1)
    val r2 = Parser.parseRule("g(x, COUNT(y)) :- tc(x, y).")
    assert(Parser.parseRule(r2.toString) == r2)
  }
}
