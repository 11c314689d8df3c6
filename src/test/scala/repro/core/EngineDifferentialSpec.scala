package repro.core

import org.apache.spark.sql.SparkSession
import repro.{SparkSpec, TestUtil}
import repro.TestUtil._
import repro.baselines.bdd.BddEngine
import repro.baselines.bigdatalog.BigDatalogLite
import repro.baselines.graspan.GraspanLite
import repro.baselines.souffle.SouffleLite
import repro.graphs.GraphData
import repro.programs.Programs

/** Cross-engine differential testing: every engine that supports a workload
  * must produce the identical fixpoint on randomized inputs — the strongest
  * end-to-end check the repo has (five independent implementations,
  * including two non-relational ones, must agree with the reference).
  */
class EngineDifferentialSpec extends SparkSpec {
  implicit def s: SparkSession = spark

  private val recstep = new RecStepEngine(RecStepConf.default)
  private val souffle = new SouffleLite()
  private val bigdatalog = new BigDatalogLite()
  private val graspan = new GraspanLite()
  private val bdd = new BddEngine()

  test("all five engines agree on TC over random graphs") {
    for (seed <- 1 to 3) {
      val edb = Map("arc" -> edgesToTuples(TestUtil.randomEdges(20, 40, seed * 100)))
      val expected = reference(Programs.tc, edb)("tc")
      for (e <- Seq(recstep, souffle, bigdatalog, graspan, bdd)) {
        val got = runEngine(e, Programs.tc, edb)
        assert(got("tc") == expected, s"${e.name} diverged on seed $seed")
      }
    }
  }

  test("supporting engines agree on SG (PBME vs in-memory vs BDD)") {
    val edb = Map("arc" -> edgesToTuples(TestUtil.randomEdges(14, 24, 77)))
    val expected = reference(Programs.sg, edb)("sg")
    for (e <- Seq(recstep, souffle, bigdatalog, bdd)) {
      assert(runEngine(e, Programs.sg, edb).apply("sg") == expected, s"${e.name} diverged")
    }
  }

  test("supporting engines agree on REACH") {
    val edb = Map(
      "arc" -> edgesToTuples(GraphData.rmat(64, 150, 5).toSet),
      "id" -> Set(Vector(1L)))
    val expected = reference(Programs.reach, edb)("reach")
    for (e <- Seq(recstep, souffle, bigdatalog, bdd))
      assert(runEngine(e, Programs.reach, edb).apply("reach") == expected, s"${e.name} diverged")
  }

  test("supporting engines agree on Andersen's analysis") {
    val edb = GraphData.andersenInput(1, seed = 99).asMap
      .map { case (k, v) => k -> edgesToTuples(v.toSet) }
    val expected = reference(Programs.andersen, edb)("pointsTo")
    for (e <- Seq(recstep, souffle, bigdatalog, bdd))
      assert(runEngine(e, Programs.andersen, edb).apply("pointsTo") == expected, s"${e.name} diverged")
  }

  test("supporting engines agree on CSPA") {
    val in = GraphData.cspaInput(nFuncs = 2, clusterSize = 6, seed = 4)
    val edb = Map(
      "assign" -> edgesToTuples(in.assign.toSet),
      "dereference" -> edgesToTuples(in.dereference.toSet))
    val expected = reference(Programs.cspa, edb)
    for (e <- Seq(recstep, souffle, graspan, bdd); p <- expected.keys)
      assert(runEngine(e, Programs.cspa, edb).apply(p) == expected(p), s"${e.name} diverged on $p")
  }

  test("supporting engines agree on CSDA") {
    val in = GraphData.csdaInput(segments = 3, segLen = 4, seed = 6)
    val edb = Map(
      "nullEdge" -> edgesToTuples(in.nullEdge.toSet),
      "arc" -> edgesToTuples(in.arc.toSet))
    val expected = reference(Programs.csda, edb)("null")
    for (e <- Seq(recstep, souffle, bigdatalog, graspan, bdd))
      assert(runEngine(e, Programs.csda, edb).apply("null") == expected, s"${e.name} diverged")
  }

  test("RecStep and BigDatalog-lite agree on CC and SSSP (recursive MIN)") {
    val ccEdb = Map("arc" -> edgesToTuples(GraphData.rmat(32, 80, 8).toSet))
    val ccExpected = reference(Programs.cc, ccEdb)
    for (e <- Seq[DatalogEngine](recstep, bigdatalog); p <- ccExpected.keys)
      assert(runEngine(e, Programs.cc, ccEdb).apply(p) == ccExpected(p), s"${e.name} diverged on $p")

    val wEdges = GraphData.weighted(GraphData.rmat(32, 90, 9), maxW = 7, seed = 3)
    val ssspEdb = Map(
      "arc" -> wEdges.map(e => Vector(e._1, e._2, e._3)).toSet,
      "id" -> Set(Vector(1L)))
    val ssspExpected = reference(Programs.sssp, ssspEdb)("sssp")
    for (e <- Seq[DatalogEngine](recstep, bigdatalog))
      assert(runEngine(e, Programs.sssp, ssspEdb).apply("sssp") == ssspExpected, s"${e.name} diverged")
  }
}
