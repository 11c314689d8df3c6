package repro.baselines

import org.apache.spark.sql.SparkSession
import repro.{SparkSpec, TestUtil}
import repro.TestUtil._
import repro.baselines.bdd.BddEngine
import repro.baselines.bigdatalog.BigDatalogLite
import repro.baselines.graspan.GraspanLite
import repro.baselines.souffle.SouffleLite
import repro.core.UnsupportedProgramException
import repro.datalog.Parser
import repro.graphs.GraphData
import repro.programs.Programs

/** Correctness + capability tests for the four baseline engines: each is
  * differentially tested against the reference evaluator on the programs it
  * supports, and must reject (with [[UnsupportedProgramException]]) exactly
  * the fragments the corresponding real system cannot evaluate (Table 1).
  */
class BaselineEnginesSpec extends SparkSpec {
  implicit def s: SparkSession = spark

  private val edges = TestUtil.randomEdges(22, 45, seed = 7)
  private val tcEdb = Map("arc" -> edgesToTuples(edges))
  private val andersenEdb = GraphData.andersenInput(1).asMap
    .map { case (k, v) => k -> edgesToTuples(v.toSet) }
  private val cspaIn = GraphData.cspaInput(nFuncs = 3, clusterSize = 5)
  private val cspaEdb = Map(
    "assign" -> edgesToTuples(cspaIn.assign.toSet),
    "dereference" -> edgesToTuples(cspaIn.dereference.toSet))
  private val csdaIn = GraphData.csdaInput(segments = 3, segLen = 3)
  private val csdaEdb = Map(
    "nullEdge" -> edgesToTuples(csdaIn.nullEdge.toSet),
    "arc" -> edgesToTuples(csdaIn.arc.toSet))
  private val ccEdb = Map("arc" -> edgesToTuples(TestUtil.randomEdges(15, 30, 8)))
  private val ssspEdb = Map(
    "arc" -> GraphData.weighted(GraphData.chain(8), 5, 2).map(e => Vector(e._1, e._2, e._3)).toSet,
    "id" -> Set(Vector(1L)))
  private val reachEdb = Map("arc" -> edgesToTuples(edges), "id" -> Set(Vector(1L)))

  // -------------------------------------------------------- Souffle-lite

  test("Souffle-lite: TC matches the reference") {
    assertMatchesReference(new SouffleLite(), Programs.tcSource, tcEdb)
  }

  test("Souffle-lite: SG matches the reference") {
    assertMatchesReference(new SouffleLite(), Programs.sgSource,
      Map("arc" -> edgesToTuples(TestUtil.randomEdges(14, 22, 9))))
  }

  test("Souffle-lite: REACH matches the reference") {
    assertMatchesReference(new SouffleLite(), Programs.reachSource, reachEdb)
  }

  test("Souffle-lite: Andersen matches the reference") {
    assertMatchesReference(new SouffleLite(), Programs.andersenSource, andersenEdb)
  }

  test("Souffle-lite: CSPA matches the reference (mutual recursion)") {
    assertMatchesReference(new SouffleLite(), Programs.cspaSource, cspaEdb)
  }

  test("Souffle-lite: CSDA matches the reference") {
    assertMatchesReference(new SouffleLite(), Programs.csdaSource, csdaEdb)
  }

  test("Souffle-lite: NTC (negation) matches the reference") {
    assertMatchesReference(new SouffleLite(), Programs.ntcSource,
      Map("arc" -> edgesToTuples(Set((1L, 2L), (2L, 3L)))))
  }

  test("Souffle-lite: GTC (non-recursive COUNT) matches the reference") {
    assertMatchesReference(new SouffleLite(), Programs.gtcSource,
      Map("arc" -> edgesToTuples(Set((1L, 2L), (2L, 3L), (1L, 3L)))))
  }

  test("Souffle-lite: single-threaded mode agrees") {
    val multi = new SouffleLite().evaluateInMemory(Programs.tc,
      Map("arc" -> edges.toSeq.map(e => Array(e._1, e._2))))
    val single = new SouffleLite(threads = 1).evaluateInMemory(Programs.tc,
      Map("arc" -> edges.toSeq.map(e => Array(e._1, e._2))))
    assert(multi("tc").map(_.toVector).toSet == single("tc").map(_.toVector).toSet)
  }

  test("Souffle-lite rejects recursive aggregation (CC, SSSP)") {
    assertThrows[UnsupportedProgramException](runEngine(new SouffleLite(), Programs.cc, ccEdb))
    assertThrows[UnsupportedProgramException](runEngine(new SouffleLite(), Programs.sssp, ssspEdb))
  }

  // ----------------------------------------------------- BigDatalog-lite

  test("BigDatalog-lite: TC matches the reference") {
    assertMatchesReference(new BigDatalogLite(), Programs.tcSource, tcEdb)
  }

  test("BigDatalog-lite: REACH matches the reference") {
    assertMatchesReference(new BigDatalogLite(), Programs.reachSource, reachEdb)
  }

  test("BigDatalog-lite: CC matches the reference (recursive MIN)") {
    assertMatchesReference(new BigDatalogLite(), Programs.ccSource, ccEdb)
  }

  test("BigDatalog-lite: SSSP matches Dijkstra semantics") {
    assertMatchesReference(new BigDatalogLite(), Programs.ssspSource, ssspEdb)
  }

  test("BigDatalog-lite: Andersen (non-linear, non-mutual) is supported") {
    assertMatchesReference(new BigDatalogLite(), Programs.andersenSource, andersenEdb)
  }

  test("BigDatalog-lite rejects mutual recursion (CSPA)") {
    val ex = intercept[UnsupportedProgramException](
      runEngine(new BigDatalogLite(), Programs.cspa, cspaEdb))
    assert(ex.getMessage.contains("mutual"))
  }

  // -------------------------------------------------------- Graspan-lite

  test("Graspan-lite: TC matches the reference") {
    assertMatchesReference(new GraspanLite(), Programs.tcSource, tcEdb)
  }

  test("Graspan-lite: CSDA matches the reference") {
    assertMatchesReference(new GraspanLite(), Programs.csdaSource, csdaEdb)
  }

  test("Graspan-lite: CSPA matches the reference") {
    assertMatchesReference(new GraspanLite(), Programs.cspaSource, cspaEdb)
  }

  test("Graspan-lite rejects unary relations (REACH) and aggregation (CC)") {
    assertThrows[UnsupportedProgramException](runEngine(new GraspanLite(), Programs.reach, reachEdb))
    assertThrows[UnsupportedProgramException](runEngine(new GraspanLite(), Programs.cc, ccEdb))
  }

  test("Graspan-lite rejects SG's inequality guard") {
    assertThrows[UnsupportedProgramException](
      runEngine(new GraspanLite(), Programs.sg, tcEdb))
  }

  // -------------------------------------------------------- BDDBDDB-lite

  test("BDDBDDB-lite: TC matches the reference") {
    assertMatchesReference(new BddEngine(), Programs.tcSource, tcEdb)
  }

  test("BDDBDDB-lite: SG matches the reference (with != guard)") {
    assertMatchesReference(new BddEngine(), Programs.sgSource,
      Map("arc" -> edgesToTuples(TestUtil.randomEdges(14, 22, 11))))
  }

  test("BDDBDDB-lite: REACH matches the reference") {
    assertMatchesReference(new BddEngine(), Programs.reachSource, reachEdb)
  }

  test("BDDBDDB-lite: Andersen matches the reference") {
    assertMatchesReference(new BddEngine(), Programs.andersenSource, andersenEdb)
  }

  test("BDDBDDB-lite: CSPA matches the reference") {
    assertMatchesReference(new BddEngine(), Programs.cspaSource, cspaEdb)
  }

  test("BDDBDDB-lite: CSDA matches the reference") {
    assertMatchesReference(new BddEngine(), Programs.csdaSource, csdaEdb)
  }

  test("BDDBDDB-lite rejects aggregation (CC, SSSP, GTC)") {
    assertThrows[UnsupportedProgramException](runEngine(new BddEngine(), Programs.cc, ccEdb))
    assertThrows[UnsupportedProgramException](runEngine(new BddEngine(), Programs.sssp, ssspEdb))
    assertThrows[UnsupportedProgramException](
      runEngine(new BddEngine(), Programs.gtc, tcEdb))
  }

  test("capability matrix matches the paper's Table 1 claims") {
    assert(!new BigDatalogLite().capabilities.mutualRecursion)
    assert(new BigDatalogLite().capabilities.recursiveAggregation)
    assert(new SouffleLite().capabilities.mutualRecursion)
    assert(!new SouffleLite().capabilities.recursiveAggregation)
    assert(!new GraspanLite().capabilities.nonRecursiveAggregation)
    assert(!new BddEngine().capabilities.recursiveAggregation)
  }
}
