package repro.ref

import org.scalatest.funsuite.AnyFunSuite
import repro.datalog.Parser
import repro.programs.Programs

/** Hand-computed fixpoints establishing the reference evaluator itself —
  * everything else in the repo is differentially tested against it.
  */
class NaiveEvaluatorSpec extends AnyFunSuite {

  private def edges(es: (Long, Long)*): Set[Vector[Long]] = es.map(e => Vector(e._1, e._2)).toSet

  test("TC of a chain 1->2->3->4") {
    val out = NaiveEvaluator.evaluate(Programs.tc, Map("arc" -> edges((1, 2), (2, 3), (3, 4))))
    assert(out("tc") == edges((1, 2), (2, 3), (3, 4), (1, 3), (2, 4), (1, 4)))
  }

  test("TC of a 3-cycle is the complete relation") {
    val out = NaiveEvaluator.evaluate(Programs.tc, Map("arc" -> edges((1, 2), (2, 3), (3, 1))))
    assert(out("tc") == (for (a <- 1L to 3L; b <- 1L to 3L) yield Vector(a, b)).toSet)
  }

  test("TC of empty graph is empty") {
    val out = NaiveEvaluator.evaluate(Programs.tc, Map("arc" -> Set.empty[Vector[Long]]))
    assert(out("tc").isEmpty)
  }

  test("SG on a small tree") {
    // parent 1 has children 2,3; 2 has child 4; 3 has child 5.
    val out = NaiveEvaluator.evaluate(Programs.sg,
      Map("arc" -> edges((1, 2), (1, 3), (2, 4), (3, 5))))
    // base: (2,3),(3,2); recursive: children of 2 x children of 3 => (4,5),(5,4)
    assert(out("sg") == edges((2, 3), (3, 2), (4, 5), (5, 4)))
  }

  test("SG recursive rule can derive diagonal pairs") {
    // sg(2,3) from parent 1; arc(2,4), arc(3,4) => sg(4,4) via the recursive rule
    val out = NaiveEvaluator.evaluate(Programs.sg,
      Map("arc" -> edges((1, 2), (1, 3), (2, 4), (3, 4))))
    assert(out("sg").contains(Vector(4L, 4L)))
  }

  test("REACH from a single source") {
    val out = NaiveEvaluator.evaluate(Programs.reach,
      Map("id" -> Set(Vector(1L)), "arc" -> edges((1, 2), (2, 3), (4, 5))))
    assert(out("reach") == Set(Vector(1L), Vector(2L), Vector(3L)))
  }

  test("CC labels two components with their minima") {
    val out = NaiveEvaluator.evaluate(Programs.cc,
      Map("arc" -> edges((1, 2), (2, 1), (2, 3), (3, 2), (5, 6), (6, 5))))
    assert(out("cc3") == edges((1, 1), (2, 1), (3, 1), (5, 5), (6, 5)))
    assert(out("cc2") == edges((1, 1), (2, 1), (3, 1), (5, 5), (6, 5)))
    assert(out("cc") == Set(Vector(1L), Vector(5L)))
  }

  test("CC label propagation follows directed edges only") {
    // 3 -> 1: only 3 gets a base label (it has an out-edge), and 3's label
    // flows forward to 1; label 1 never reaches 3.
    val out = NaiveEvaluator.evaluate(Programs.cc, Map("arc" -> edges((3, 1))))
    assert(out("cc3") == edges((3, 3), (1, 3)))
  }

  test("SSSP shortest distances") {
    val arc3 = Set(Vector(1L, 2L, 10L), Vector(1L, 3L, 2L), Vector(3L, 2L, 3L), Vector(2L, 4L, 1L))
    val out = NaiveEvaluator.evaluate(Programs.sssp, Map("id" -> Set(Vector(1L)), "arc" -> arc3))
    assert(out("sssp") == Set(Vector(1L, 0L), Vector(3L, 2L), Vector(2L, 5L), Vector(4L, 6L)))
  }

  test("SSSP on a graph with a cycle terminates with min distances") {
    val arc3 = Set(Vector(1L, 2L, 1L), Vector(2L, 3L, 1L), Vector(3L, 1L, 1L))
    val out = NaiveEvaluator.evaluate(Programs.sssp, Map("id" -> Set(Vector(1L)), "arc" -> arc3))
    assert(out("sssp") == Set(Vector(1L, 0L), Vector(2L, 1L), Vector(3L, 2L)))
  }

  test("Andersen points-to: address-of and assignment") {
    // y = &x  (addressOf(y,x));  z = y (assign(z,y))
    val out = NaiveEvaluator.evaluate(Programs.andersen, Map(
      "addressOf" -> edges((2, 1)), "assign" -> edges((3, 2)),
      "load" -> Set.empty[Vector[Long]], "store" -> Set.empty[Vector[Long]]))
    assert(out("pointsTo") == edges((2, 1), (3, 1)))
  }

  test("Andersen load rule: y = *x") {
    // pointsTo(x,z), pointsTo(z,w), load(y,x) => pointsTo(y,w)
    val out = NaiveEvaluator.evaluate(Programs.andersen, Map(
      "addressOf" -> edges((10, 20), (20, 30)),
      "assign" -> Set.empty[Vector[Long]],
      "load" -> edges((40, 10)),
      "store" -> Set.empty[Vector[Long]]))
    assert(out("pointsTo").contains(Vector(40L, 30L)))
  }

  test("Andersen store rule: *x = y") {
    // store(y,x): pointsTo(y,z), pointsTo(x,w) => pointsTo(z,w)
    val out = NaiveEvaluator.evaluate(Programs.andersen, Map(
      "addressOf" -> edges((10, 20), (30, 40)),
      "assign" -> Set.empty[Vector[Long]],
      "load" -> Set.empty[Vector[Long]],
      "store" -> edges((10, 30))))
    assert(out("pointsTo").contains(Vector(20L, 40L)))
  }

  test("CSDA propagates null facts along the CFG") {
    val out = NaiveEvaluator.evaluate(Programs.csda, Map(
      "nullEdge" -> edges((1, 2)), "arc" -> edges((2, 3), (3, 4))))
    assert(out("null") == edges((1, 2), (1, 3), (1, 4)))
  }

  test("CSPA: assignment chain value flow") {
    val out = NaiveEvaluator.evaluate(Programs.cspa, Map(
      "assign" -> edges((2, 1), (3, 2)), "dereference" -> Set.empty[Vector[Long]]))
    // valueFlow includes base edges, self-loops, and the transitive edge
    assert(out("valueFlow").contains(Vector(3L, 1L)))
    assert(out("valueFlow").contains(Vector(1L, 1L)))
    assert(out("valueAlias").contains(Vector(1L, 2L))) // via vF(3,1), vF(3,2)
  }

  test("NTC: complement of transitive closure") {
    val out = NaiveEvaluator.evaluate(Programs.ntc, Map("arc" -> edges((1, 2))))
    // nodes {1,2}; tc = {(1,2)}; ntc = all pairs minus tc
    assert(out("ntc") == edges((1, 1), (2, 1), (2, 2)))
  }

  test("GTC: count of reachable vertices per source") {
    val out = NaiveEvaluator.evaluate(Programs.gtc, Map("arc" -> edges((1, 2), (2, 3))))
    assert(out("gtc") == edges((1, 2), (2, 1))) // 1 reaches {2,3}; 2 reaches {3}
  }

  test("facts evaluate to themselves") {
    val p = Parser.parse("e(1,2). e(2,3). t(x,y) :- e(x,y). t(x,y) :- t(x,z), e(z,y).")
    val out = NaiveEvaluator.evaluate(p, Map.empty)
    assert(out("t") == edges((1, 2), (2, 3), (1, 3)))
  }

  test("comparison filters bindings") {
    val p = Parser.parse("big(x,y) :- e(x,y), x < y.")
    val out = NaiveEvaluator.evaluate(p, Map("e" -> edges((1, 2), (2, 1), (3, 3))))
    assert(out("big") == edges((1, 2)))
  }

  test("mergeAgg keeps the best value per group") {
    val sig = repro.datalog.Analyzer.AggSignature(Seq(0), 1, repro.datalog.AggOp.Min)
    val merged = NaiveEvaluator.mergeAgg(
      Seq(Vector(1L, 5L), Vector(1L, 3L), Vector(2L, 7L)), sig)
    assert(merged == Set(Vector(1L, 3L), Vector(2L, 7L)))
  }
}
