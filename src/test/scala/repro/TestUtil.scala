package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.DatalogEngine
import repro.datalog.{Parser, Program}
import repro.graphs.GraphData
import repro.ref.NaiveEvaluator
import scala.util.Random

/** Shared helpers for test suites: tuple-set conversions, random graphs,
  * engine runners, and differential assertions against [[NaiveEvaluator]].
  */
object TestUtil {

  type TupleSet = Set[Vector[Long]]

  /** Run a raw ScalaCheck property inside a scalatest test (no scalatestplus
    * bridge is available offline).
    */
  def checkProp(prop: org.scalacheck.Prop, minTests: Int = 50): Unit = {
    val params = org.scalacheck.Test.Parameters.default.withMinSuccessfulTests(minTests)
    val res = org.scalacheck.Test.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }

  def dfToSet(df: DataFrame): TupleSet =
    df.collect().map(r => Vector.tabulate(r.size)(i => r.getLong(i))).toSet

  def edgesDF(spark: SparkSession, edges: Seq[(Long, Long)]): DataFrame =
    GraphData.toDF(spark, edges.toVector)

  def unaryDF(spark: SparkSession, ids: Seq[Long]): DataFrame =
    GraphData.toDF1(spark, ids.toVector)

  def edbToDF(spark: SparkSession, edb: Map[String, Set[Vector[Long]]]): Map[String, DataFrame] =
    edb.map { case (p, ts) =>
      val arity = if (ts.isEmpty) 2 else ts.head.size
      p -> GraphData.tuplesToDF(spark, ts.toSeq, arity)
    }

  /** Random digraph edge set over {1..n} with ~m edges, deterministic in seed. */
  def randomEdges(n: Int, m: Int, seed: Long): Set[(Long, Long)] = {
    val rnd = new Random(seed)
    Iterator.continually((rnd.nextInt(n).toLong + 1, rnd.nextInt(n).toLong + 1))
      .filter { case (a, b) => a != b }
      .take(m * 2).toSet.take(m)
  }

  /** Run `engine` on `program` over an in-memory EDB; returns IDB tuple sets. */
  def runEngine(
      engine: DatalogEngine,
      program: Program,
      edb: Map[String, Set[Vector[Long]]],
  )(implicit spark: SparkSession): Map[String, TupleSet] =
    engine.evaluate(program, edbToDF(spark, edb))(spark).map { case (p, df) => p -> dfToSet(df) }

  /** Ground truth from the reference evaluator. */
  def reference(program: Program, edb: Map[String, Set[Vector[Long]]]): Map[String, TupleSet] =
    NaiveEvaluator.evaluate(program, edb)

  /** Assert an engine agrees with the reference evaluator on every IDB. */
  def assertMatchesReference(
      engine: DatalogEngine,
      programSource: String,
      edb: Map[String, Set[Vector[Long]]],
  )(implicit spark: SparkSession): Unit = {
    val program = Parser.parse(programSource)
    val expected = reference(program, edb)
    val got = runEngine(engine, program, edb)
    for ((p, exp) <- expected) {
      val g = got.getOrElse(p, Set.empty)
      assert(g == exp,
        s"[${engine.name}] relation '$p' mismatch: got ${g.size} rows, expected ${exp.size};" +
          s" missing=${(exp -- g).take(5)} extra=${(g -- exp).take(5)}")
    }
  }

  def edgesToTuples(edges: Set[(Long, Long)]): Set[Vector[Long]] =
    edges.map { case (a, b) => Vector(a, b) }

  /** In-memory Dijkstra for SSSP ground truth on weighted digraphs. */
  def dijkstra(edges: Seq[(Long, Long, Long)], sources: Set[Long]): Map[Long, Long] = {
    val adj = edges.groupBy(_._1)
    val dist = scala.collection.mutable.Map.empty[Long, Long]
    val pq = scala.collection.mutable.PriorityQueue.empty[(Long, Long)](Ordering.by(-_._1))
    sources.foreach { s => dist(s) = 0L; pq.enqueue((0L, s)) }
    while (pq.nonEmpty) {
      val (d, u) = pq.dequeue()
      if (dist(u) == d) {
        adj.getOrElse(u, Seq.empty).foreach { case (_, v, w) =>
          if (dist.get(v).forall(_ > d + w)) { dist(v) = d + w; pq.enqueue((d + w, v)) }
        }
      }
    }
    dist.toMap
  }

  /** In-memory union-find connected components (over the undirected view,
    * restricted to the CC program's label-propagation semantics on the
    * directed graph: here we propagate min labels along directed edges to a
    * fixpoint, matching the Datalog program exactly.)
    */
  def ccLabels(edges: Set[(Long, Long)]): Map[Long, Long] = {
    // cc3(x, MIN(x)) :- arc(x,_).  cc3(y, MIN(z)) :- cc3(x,z), arc(x,y).
    val labels = scala.collection.mutable.Map.empty[Long, Long]
    edges.foreach { case (x, _) => labels(x) = math.min(labels.getOrElse(x, x), x) }
    var changed = true
    while (changed) {
      changed = false
      edges.foreach { case (x, y) =>
        labels.get(x).foreach { lx =>
          if (labels.get(y).forall(_ > lx)) { labels(y) = lx; changed = true }
        }
      }
    }
    labels.toMap
  }
}
