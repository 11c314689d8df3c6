package repro.core

import org.apache.spark.sql.SparkSession
import repro.{Oracle, SparkSpec, TestUtil}
import repro.TestUtil._
import repro.datalog.Parser
import repro.graphs.GraphData
import repro.programs.Programs

class RecStepEngineSpec extends SparkSpec {
  implicit def s: SparkSession = spark

  private val relConf = RecStepConf() // all opts on, PBME off (relational path)
  private def engine(conf: RecStepConf = relConf) = new RecStepEngine(conf)

  private def run(eng: DatalogEngine, p: repro.datalog.Program,
                  edb: Map[String, Set[Vector[Long]]]): Map[String, Set[Vector[Long]]] =
    TestUtil.runEngine(eng, p, edb)(spark)

  private val edges1 = TestUtil.randomEdges(25, 60, seed = 1)
  private val edges2 = TestUtil.randomEdges(40, 70, seed = 2)

  // ---------------------------------------------------------------- TC

  test("TC matches the DuckDB recursive-CTE oracle") {
    val arc = edgesDF(spark, edges1.toSeq)
    val out = engine().evaluate(Programs.tc, Map("arc" -> arc))
    Oracle.assertEquivalent(out("tc"),
      """WITH RECURSIVE tc(c0, c1) AS (
        |  SELECT c0, c1 FROM arc
        |  UNION
        |  SELECT tc.c0, arc.c1 FROM tc JOIN arc ON tc.c1 = arc.c0
        |) SELECT c0, c1 FROM tc""".stripMargin,
      "arc" -> arc)
  }

  test("TC on a cycle matches the reference") {
    assertMatchesReference(engine(), Programs.tcSource,
      Map("arc" -> edgesToTuples(Set((1L, 2L), (2L, 3L), (3L, 1L)))))
  }

  test("TC on an empty graph") {
    val out = engine().evaluate(Programs.tc, Map("arc" -> edgesDF(spark, Seq.empty)))
    assert(out("tc").count() == 0)
  }

  test("every optimization configuration computes the same TC fixpoint") {
    val edb = Map("arc" -> edgesToTuples(edges1))
    val expected = reference(Programs.tc, edb)("tc")
    val configs = Seq(
      "default"   -> relConf,
      "noOp"      -> RecStepConf.noOp,
      "no-uie"    -> relConf.copy(uie = false),
      "oof-na"    -> relConf.copy(oof = OofMode.NoAnalyze),
      "oof-fa"    -> relConf.copy(oof = OofMode.FullAnalyze),
      "opsd-only" -> relConf.copy(dsd = DsdMode.Opsd),
      "tpsd-only" -> relConf.copy(dsd = DsdMode.Tpsd),
      "no-eost"   -> relConf.copy(eost = false),
      "no-fdedup" -> relConf.copy(fastDedup = false),
      "pbme"      -> relConf.copy(pbme = true),
    )
    for ((name, conf) <- configs) {
      val got = run(engine(conf), Programs.tc, edb)("tc")
      assert(got == expected, s"config '$name' diverged")
    }
  }

  // ---------------------------------------------------------------- SG

  test("SG matches the DuckDB recursive-CTE oracle") {
    val arc = edgesDF(spark, GraphData.tree(14) ++ Seq((3L, 9L)))
    val out = engine().evaluate(Programs.sg, Map("arc" -> arc))
    Oracle.assertEquivalent(out("sg"),
      """WITH RECURSIVE sg(c0, c1) AS (
        |  SELECT a1.c1, a2.c1 FROM arc a1 JOIN arc a2 ON a1.c0 = a2.c0 WHERE a1.c1 <> a2.c1
        |  UNION
        |  SELECT a1.c1, a2.c1 FROM arc a1 JOIN sg ON a1.c0 = sg.c0
        |                      JOIN arc a2 ON a2.c0 = sg.c1
        |) SELECT c0, c1 FROM sg""".stripMargin,
      "arc" -> arc)
  }

  test("SG with PBME enabled matches the relational path") {
    val edb = Map("arc" -> edgesToTuples(TestUtil.randomEdges(15, 25, seed = 3)))
    val rel = run(engine(), Programs.sg, edb)("sg")
    val viaPbme = run(engine(relConf.copy(pbme = true)), Programs.sg, edb)("sg")
    assert(viaPbme == rel)
  }

  // ------------------------------------------------------------- REACH

  test("REACH matches the reference") {
    assertMatchesReference(engine(), Programs.reachSource,
      Map("arc" -> edgesToTuples(edges2), "id" -> Set(Vector(1L))))
  }

  test("REACH with unreachable vertices") {
    val edb = Map(
      "arc" -> edgesToTuples(Set((1L, 2L), (3L, 4L))),
      "id" -> Set(Vector(1L)))
    val got = run(engine(), Programs.reach, edb)("reach")
    assert(got == Set(Vector(1L), Vector(2L)))
  }

  // ----------------------------------------------------- CC and SSSP (agg)

  test("CC matches the label-propagation reference") {
    val edb = Map("arc" -> edgesToTuples(edges2))
    assertMatchesReference(engine(), Programs.ccSource, edb)
  }

  test("CC labels each strongly-reachable region by its minimum") {
    // undirected-style graph given as both directions
    val und = Set((1L, 2L), (2L, 1L), (2L, 3L), (3L, 2L), (7L, 8L), (8L, 7L))
    val got = run(engine(), Programs.cc, Map("arc" -> edgesToTuples(und)))
    assert(got("cc") == Set(Vector(1L), Vector(7L)))
    val labels = TestUtil.ccLabels(und)
    assert(got("cc3") == labels.map { case (v, l) => Vector(v, l) }.toSet)
  }

  test("SSSP matches Dijkstra") {
    val wEdges = GraphData.weighted(TestUtil.randomEdges(20, 50, seed = 4).toVector, maxW = 9, seed = 5)
    val edb = Map(
      "arc" -> wEdges.map(e => Vector(e._1, e._2, e._3)).toSet,
      "id" -> Set(Vector(1L)))
    val got = run(engine(), Programs.sssp, edb)("sssp")
    val expected = TestUtil.dijkstra(wEdges, Set(1L)).map { case (v, d) => Vector(v, d) }.toSet
    assert(got == expected)
  }

  test("SSSP with all optimizations off matches too") {
    val wEdges = GraphData.weighted(GraphData.chain(12), maxW = 5, seed = 6)
    val edb = Map(
      "arc" -> wEdges.map(e => Vector(e._1, e._2, e._3)).toSet,
      "id" -> Set(Vector(1L)))
    val a = run(engine(), Programs.sssp, edb)("sssp")
    val b = run(engine(RecStepConf.noOp), Programs.sssp, edb)("sssp")
    assert(a == b)
    assert(a == TestUtil.dijkstra(wEdges, Set(1L)).map { case (v, d) => Vector(v, d) }.toSet)
  }

  // ----------------------------------------------------- program analysis

  test("Andersen matches the reference") {
    val in = GraphData.andersenInput(1)
    assertMatchesReference(engine(), Programs.andersenSource,
      in.asMap.map { case (k, v) => k -> edgesToTuples(v.toSet) })
  }

  test("CSPA matches the reference (mutual recursion)") {
    val in = GraphData.cspaInput(nFuncs = 3, clusterSize = 5)
    assertMatchesReference(engine(), Programs.cspaSource,
      Map("assign" -> edgesToTuples(in.assign.toSet),
          "dereference" -> edgesToTuples(in.dereference.toSet)))
  }

  test("CSDA matches the reference (many iterations)") {
    val in = GraphData.csdaInput(segments = 4, segLen = 3)
    assertMatchesReference(engine(), Programs.csdaSource,
      Map("nullEdge" -> edgesToTuples(in.nullEdge.toSet),
          "arc" -> edgesToTuples(in.arc.toSet)))
  }

  // ------------------------------------------------- negation, aggregation

  test("NTC (stratified negation) matches the DuckDB oracle") {
    val arc = edgesDF(spark, Seq((1L, 2L), (2L, 3L)))
    val out = engine().evaluate(Programs.ntc, Map("arc" -> arc))
    Oracle.assertEquivalent(out("ntc"),
      """WITH RECURSIVE tc(c0, c1) AS (
        |  SELECT c0, c1 FROM arc
        |  UNION
        |  SELECT tc.c0, arc.c1 FROM tc JOIN arc ON tc.c1 = arc.c0
        |), node(c0) AS (
        |  SELECT DISTINCT c0 FROM (SELECT c0 FROM arc UNION ALL SELECT c1 AS c0 FROM arc)
        |)
        |SELECT n1.c0 AS c0, n2.c0 AS c1 FROM node n1, node n2
        |WHERE NOT EXISTS (SELECT 1 FROM tc WHERE tc.c0 = n1.c0 AND tc.c1 = n2.c0)""".stripMargin,
      "arc" -> arc)
  }

  test("GTC (non-recursive COUNT) matches the reference") {
    assertMatchesReference(engine(), Programs.gtcSource,
      Map("arc" -> edgesToTuples(Set((1L, 2L), (2L, 3L), (3L, 4L)))))
  }

  test("fact rules seed recursion") {
    assertMatchesReference(engine(),
      "e(1,2). e(2,3). t(x,y) :- e(x,y). t(x,y) :- t(x,z), e(z,y).",
      Map.empty)
  }

  test("missing EDB relation raises a clear error") {
    val ex = intercept[IllegalArgumentException](
      engine().evaluate(Programs.tc, Map.empty))
    assert(ex.getMessage.contains("arc"))
  }

  test("capabilities cover the full language") {
    val c = engine().capabilities
    assert(c.mutualRecursion && c.nonRecursiveAggregation && c.recursiveAggregation && c.negation)
  }

  test("deep chain exercises many iterations and compaction") {
    val conf = relConf.copy(compactEvery = 5)
    val edb = Map(
      "arc" -> edgesToTuples(GraphData.chain(40).toSet),
      "nullEdge" -> Set(Vector(1L, 2L)))
    val got = run(engine(conf), Programs.csda, edb)
    val expected = reference(Programs.csda, edb)
    assert(got("null") == expected("null"))
  }
}
