package repro.programs

import org.scalatest.funsuite.AnyFunSuite
import repro.datalog.Analyzer

/** The benchmark programs must have exactly the structural properties the
  * paper relies on (Table 1's fragment classification drives which engines
  * can run which workloads).
  */
class ProgramsSpec extends AnyFunSuite {

  test("byName exposes the eight benchmark programs") {
    assert(Programs.byName.keySet ==
      Set("TC", "SG", "REACH", "CC", "SSSP", "AA", "CSPA", "CSDA"))
  }

  test("TC/SG/REACH/CSDA are linear, non-mutual, aggregation-free") {
    for (p <- Seq(Programs.tc, Programs.sg, Programs.reach, Programs.csda)) {
      val a = Analyzer.analyze(p)
      assert(a.hasRecursion && !a.hasMutualRecursion && !a.hasNonLinearRecursion)
      assert(!a.hasRecursiveAggregation && !a.hasNonRecursiveAggregation)
    }
  }

  test("CC and SSSP use recursive MIN aggregation") {
    for (p <- Seq(Programs.cc, Programs.sssp)) {
      val a = Analyzer.analyze(p)
      assert(a.hasRecursiveAggregation)
    }
  }

  test("AA is non-linear; CSPA is mutually recursive") {
    assert(Analyzer.analyze(Programs.andersen).hasNonLinearRecursion)
    assert(Analyzer.analyze(Programs.cspa).hasMutualRecursion)
  }

  test("CSPA has exactly the paper's ten rules") {
    assert(Programs.cspa.rules.size == 10)
    assert(Programs.cspa.idbPreds == Set("valueFlow", "valueAlias", "memoryAlias"))
    assert(Programs.cspa.edbPreds == Set("assign", "dereference"))
  }

  test("SSSP arc is ternary (weighted)") {
    assert(Analyzer.analyze(Programs.sssp).arities("arc") == 3)
  }

  test("NTC uses stratified negation") {
    assert(Analyzer.analyze(Programs.ntc).hasNegation)
  }

  test("all programs pass analysis without exception") {
    (Programs.byName.values ++ Seq(Programs.ntc, Programs.gtc)).foreach(Analyzer.analyze)
  }
}
