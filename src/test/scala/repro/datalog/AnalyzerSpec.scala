package repro.datalog

import org.scalatest.funsuite.AnyFunSuite
import repro.programs.Programs

class AnalyzerSpec extends AnyFunSuite {

  private def analyze(src: String) = Analyzer.analyze(Parser.parse(src))

  test("TC: idb/edb split") {
    val a = Analyzer.analyze(Programs.tc)
    assert(a.idbs == Set("tc"))
    assert(a.edbs == Set("arc"))
    assert(a.arities == Map("tc" -> 2, "arc" -> 2))
  }

  test("TC: single recursive stratum") {
    val a = Analyzer.analyze(Programs.tc)
    assert(a.strata.size == 1)
    assert(a.strata.head.recursive)
    assert(!a.strata.head.mutual)
    assert(!a.strata.head.nonLinear)
  }

  test("SG is recursive and linear") {
    val a = Analyzer.analyze(Programs.sg)
    assert(a.hasRecursion && !a.hasMutualRecursion && !a.hasNonLinearRecursion)
  }

  test("Andersen is non-linear but not mutual") {
    val a = Analyzer.analyze(Programs.andersen)
    assert(a.hasNonLinearRecursion)
    assert(!a.hasMutualRecursion)
  }

  test("CSPA is mutually recursive") {
    val a = Analyzer.analyze(Programs.cspa)
    assert(a.hasMutualRecursion)
    val rec = a.strata.find(_.mutual).get
    assert(rec.preds == Set("valueFlow", "valueAlias", "memoryAlias"))
  }

  test("CSDA is linear, non-mutual") {
    val a = Analyzer.analyze(Programs.csda)
    assert(a.hasRecursion && !a.hasMutualRecursion && !a.hasNonLinearRecursion)
  }

  test("CC: cc3 is a recursive MIN aggregate") {
    val a = Analyzer.analyze(Programs.cc)
    val s = a.strata.find(_.preds.contains("cc3")).get
    assert(s.recursive)
    assert(s.recursiveAggs("cc3") == Analyzer.AggSignature(Seq(0), 1, AggOp.Min))
    assert(a.hasRecursiveAggregation)
  }

  test("CC: cc2 and cc are non-recursive strata after cc3") {
    val a = Analyzer.analyze(Programs.cc)
    val i3 = a.strata.find(_.preds.contains("cc3")).get.index
    val i2 = a.strata.find(_.preds.contains("cc2")).get.index
    val i1 = a.strata.find(_.preds.contains("cc")).get.index
    assert(i3 < i2 && i2 < i1)
    assert(!a.strata.find(_.preds.contains("cc2")).get.recursive)
  }

  test("SSSP: sssp2 recursive MIN aggregate, sssp non-recursive") {
    val a = Analyzer.analyze(Programs.sssp)
    val s = a.strata.find(_.preds.contains("sssp2")).get
    assert(s.recursiveAggs.contains("sssp2"))
    assert(!a.strata.find(_.preds.contains("sssp")).get.recursive)
  }

  test("REACH: recursive, no aggregation") {
    val a = Analyzer.analyze(Programs.reach)
    assert(a.hasRecursion && !a.hasRecursiveAggregation && !a.hasNonRecursiveAggregation)
  }

  test("NTC: negation is stratified, tc before ntc") {
    val a = Analyzer.analyze(Programs.ntc)
    assert(a.hasNegation)
    val iTc = a.strata.find(_.preds.contains("tc")).get.index
    val iNtc = a.strata.find(_.preds.contains("ntc")).get.index
    assert(iTc < iNtc)
  }

  test("GTC: COUNT is a non-recursive aggregation") {
    val a = Analyzer.analyze(Programs.gtc)
    assert(a.hasNonRecursiveAggregation && !a.hasRecursiveAggregation)
  }

  test("strata are topologically ordered (dependencies first)") {
    val a = Analyzer.analyze(Programs.cspa)
    val idx = a.strata.flatMap(s => s.preds.map(_ -> s.index)).toMap
    for {
      s <- a.strata; r <- s.rules
      atom <- r.positiveAtoms if a.idbs.contains(atom.pred)
    } assert(idx(atom.pred) <= s.index, s"${atom.pred} must not be above ${r.head.pred}")
  }

  test("rejects unsafe head variable") {
    val e = intercept[Analyzer.AnalysisException](analyze("a(x, y) :- b(x)."))
    assert(e.msg.contains("unsafe"))
  }

  test("rejects unsafe negated variable") {
    assertThrows[Analyzer.AnalysisException](analyze("a(x) :- b(x), !c(x, y)."))
  }

  test("rejects unsafe comparison variable") {
    assertThrows[Analyzer.AnalysisException](analyze("a(x) :- b(x), x < y."))
  }

  test("negated atoms bound by positive atoms are safe") {
    val a = analyze("a(x) :- b(x), !c(x). ")
    assert(a.idbs == Set("a"))
  }

  test("rejects unstratifiable negation (negative cycle)") {
    val e = intercept[Analyzer.AnalysisException](
      analyze("p(x) :- b(x), !q(x). q(x) :- b(x), !p(x)."))
    assert(e.msg.contains("stratified"))
  }

  test("rejects self-negation") {
    assertThrows[Analyzer.AnalysisException](analyze("p(x) :- b(x), !p(x)."))
  }

  test("rejects arity mismatch") {
    assertThrows[Analyzer.AnalysisException](analyze("a(x) :- b(x, y). c(x) :- b(x)."))
  }

  test("rejects recursive SUM aggregation") {
    assertThrows[Analyzer.AnalysisException](
      analyze("s(x, SUM(y)) :- e(x, y). s(x, SUM(y)) :- s(x, y), e(x, y)."))
  }

  test("rejects mixed aggregated and plain heads in a recursive stratum") {
    assertThrows[Analyzer.AnalysisException](
      analyze("s(x, MIN(y)) :- e(x, y). s(x, y) :- s(x, y), e(y, x)."))
  }

  test("rejects non-recursive aggregation over a same-stratum predicate") {
    // q aggregates p while p depends on q — same SCC
    assertThrows[Analyzer.AnalysisException](
      analyze("p(x, y) :- q(x, y). p(x,y) :- e(x,y). q(x, COUNT(y)) :- p(x, y)."))
  }

  test("Tarjan finds the single SCC of a cycle") {
    val sccs = Analyzer.tarjan(3, IndexedSeq(Set(1), Set(2), Set(0)))
    assert(sccs.map(_.toSet) == Vector(Set(0, 1, 2)))
  }

  test("Tarjan on a DAG yields singleton SCCs") {
    val sccs = Analyzer.tarjan(3, IndexedSeq(Set(1), Set(2), Set.empty[Int]))
    assert(sccs.map(_.toSet).toSet == Set(Set(0), Set(1), Set(2)))
    assert(sccs.size == 3)
  }

  test("Tarjan separates two cycles joined by an edge") {
    // 0<->1 -> 2<->3
    val sccs = Analyzer.tarjan(4, IndexedSeq(Set(1), Set(0, 2), Set(3), Set(2)))
    assert(sccs.map(_.toSet).toSet == Set(Set(0, 1), Set(2, 3)))
  }

  test("facts are allowed and ground") {
    val a = analyze("p(1, 2). q(x) :- p(x, y).")
    assert(a.idbs == Set("p", "q"))
    assert(a.edbs.isEmpty)
  }

  test("non-recursive program has only non-recursive strata") {
    val a = analyze("a(x) :- e(x, y). b(x) :- a(x).")
    assert(a.strata.forall(!_.recursive))
  }

  test("same-generation base+recursive land in expected strata shapes") {
    val a = Analyzer.analyze(Programs.sg)
    assert(a.strata.size == 1)
    assert(a.strata.head.rules.size == 2)
  }
}
