package repro.core

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}
import repro.datalog.Parser
import repro.graphs.GraphData

/** Every compiled rule plan is checked against DuckDB running the
  * equivalent SQL over the same inputs (the repo-wide correctness oracle).
  */
class PlanGeneratorSpec extends SparkSpec {

  private def rel(tuples: (Long, Long)*): DataFrame =
    GraphData.toDF(spark, tuples.toVector)
  private def rel1(ids: Long*): DataFrame = GraphData.toDF1(spark, ids.toVector)

  private def compile(ruleSrc: String, rels: Map[String, DataFrame]): DataFrame =
    PlanGenerator.compileRule(Parser.parseRule(ruleSrc), (atom, _) => rels(atom.pred))

  private val e = rel((1, 2), (2, 3), (3, 4), (1, 3), (4, 2), (5, 5))
  private val f = rel((2, 10), (3, 20), (2, 30), (9, 9))

  test("copy rule") {
    val df = compile("p(x, y) :- e(x, y).", Map("e" -> e))
    Oracle.assertEquivalent(df, "SELECT c0, c1 FROM e", "e" -> e)
  }

  test("projection with column swap") {
    val df = compile("p(y, x) :- e(x, y).", Map("e" -> e))
    Oracle.assertEquivalent(df, "SELECT c1 AS c0, c0 AS c1 FROM e", "e" -> e)
  }

  test("projection dropping a column keeps duplicates (UNION ALL semantics)") {
    val df = compile("p(x) :- e(x, y).", Map("e" -> e))
    Oracle.assertEquivalent(df, "SELECT c0 FROM e", "e" -> e)
  }

  test("binary join on shared variable") {
    val df = compile("p(x, z) :- e(x, y), f(y, z).", Map("e" -> e, "f" -> f))
    Oracle.assertEquivalent(df,
      "SELECT e.c0 AS c0, f.c1 AS c1 FROM e JOIN f ON e.c1 = f.c0",
      "e" -> e, "f" -> f)
  }

  test("self join") {
    val df = compile("p(x, z) :- e(x, y), e(y, z).", Map("e" -> e))
    Oracle.assertEquivalent(df,
      "SELECT a.c0 AS c0, b.c1 AS c1 FROM e a JOIN e b ON a.c1 = b.c0",
      "e" -> e)
  }

  test("three-way chain join") {
    val df = compile("p(x, w) :- e(x, y), e(y, z), e(z, w).", Map("e" -> e))
    Oracle.assertEquivalent(df,
      "SELECT a.c0 AS c0, c.c1 AS c1 FROM e a JOIN e b ON a.c1 = b.c0 JOIN e c ON b.c1 = c.c0",
      "e" -> e)
  }

  test("constant in body atom becomes a filter") {
    val df = compile("p(x) :- e(x, 3).", Map("e" -> e))
    Oracle.assertEquivalent(df, "SELECT c0 FROM e WHERE c1 = '3'", "e" -> e)
  }

  test("repeated variable within an atom") {
    val df = compile("p(x) :- e(x, x).", Map("e" -> e))
    Oracle.assertEquivalent(df, "SELECT c0 FROM e WHERE c0 = c1", "e" -> e)
  }

  test("comparison literal filters") {
    val df = compile("p(x, y) :- e(x, y), x < y.", Map("e" -> e))
    Oracle.assertEquivalent(df,
      "SELECT c0, c1 FROM e WHERE CAST(c0 AS BIGINT) < CAST(c1 AS BIGINT)", "e" -> e)
  }

  test("inequality comparison") {
    val df = compile("p(x, y) :- e(x, y), x != y.", Map("e" -> e))
    Oracle.assertEquivalent(df,
      "SELECT c0, c1 FROM e WHERE c0 <> c1", "e" -> e)
  }

  test("negated atom becomes an anti join") {
    val g = rel((1, 2), (3, 4))
    val df = compile("p(x, y) :- e(x, y), !g(x, y).", Map("e" -> e, "g" -> g))
    Oracle.assertEquivalent(df,
      "SELECT c0, c1 FROM e WHERE NOT EXISTS (SELECT 1 FROM g WHERE g.c0 = e.c0 AND g.c1 = e.c1)",
      "e" -> e, "g" -> g)
  }

  test("negated atom with a constant") {
    val g = rel((1, 2), (3, 4))
    val df = compile("p(x) :- e(x, y), !g(x, 2).", Map("e" -> e, "g" -> g))
    Oracle.assertEquivalent(df,
      "SELECT c0 FROM e WHERE NOT EXISTS (SELECT 1 FROM g WHERE g.c0 = e.c0 AND g.c1 = '2')",
      "e" -> e, "g" -> g)
  }

  test("cross join when atoms share no variables") {
    val a = rel1(1, 2); val b = rel1(7, 8)
    val df = compile("p(x, y) :- a(x), b(y).", Map("a" -> a, "b" -> b))
    Oracle.assertEquivalent(df,
      "SELECT a.c0 AS c0, b.c0 AS c1 FROM a, b", "a" -> a, "b" -> b)
  }

  test("COUNT aggregation groups by the plain head term") {
    val df = compile("g(x, COUNT(y)) :- e(x, y).", Map("e" -> e))
    Oracle.assertEquivalent(df,
      "SELECT c0, COUNT(c1) AS c1 FROM e GROUP BY c0", "e" -> e)
  }

  test("MIN and MAX aggregation") {
    val dfMin = compile("g(x, MIN(y)) :- f(x, y).", Map("f" -> f))
    Oracle.assertEquivalent(dfMin,
      "SELECT c0, MIN(CAST(c1 AS BIGINT)) AS c1 FROM f GROUP BY c0", "f" -> f)
    val dfMax = compile("g(x, MAX(y)) :- f(x, y).", Map("f" -> f))
    Oracle.assertEquivalent(dfMax,
      "SELECT c0, MAX(CAST(c1 AS BIGINT)) AS c1 FROM f GROUP BY c0", "f" -> f)
  }

  test("SUM aggregation over an arithmetic expression") {
    val df = compile("g(x, SUM(y + y)) :- f(x, y).", Map("f" -> f))
    Oracle.assertEquivalent(df,
      "SELECT c0, SUM(CAST(c1 AS BIGINT) * 2) AS c1 FROM f GROUP BY c0", "f" -> f)
  }

  test("AVG uses integer (floor) semantics") {
    val df = compile("g(x, AVG(y)) :- f(x, y).", Map("f" -> f))
    Oracle.assertEquivalent(df,
      "SELECT c0, CAST(FLOOR(AVG(CAST(c1 AS BIGINT))) AS BIGINT) AS c1 FROM f GROUP BY c0",
      "f" -> f)
  }

  test("aggregation without group keys") {
    val df = compile("g(COUNT(y)) :- e(x, y).", Map("e" -> e))
    Oracle.assertEquivalent(df, "SELECT COUNT(c1) AS c0 FROM e", "e" -> e)
  }

  test("constant head term") {
    val df = compile("p(x, 5) :- e(x, y), x = 1.", Map("e" -> e))
    Oracle.assertEquivalent(df, "SELECT c0, '5' AS c1 FROM e WHERE c0 = '1'", "e" -> e)
  }

  test("fact rule compiles to a single constant row") {
    val df = PlanGenerator.compileRule(Parser.parseRule("p(7, 8)."), (_, _) => sys.error("no atoms"))
    assert(df.collect().map(r => (r.getLong(0), r.getLong(1))).toSeq == Seq((7L, 8L)))
  }

  test("delta substitution picks the designated occurrence") {
    val full = rel((1, 2), (2, 3))
    val delta = rel((2, 3))
    val rule = Parser.parseRule("p(x, z) :- e(x, y), e(y, z).")
    // delta at occurrence 0: (2,3) joins full on y=3 — no (3,_) edge
    val df0 = PlanGenerator.compileRule(rule, (_, occ) => if (occ == 0) delta else full)
    assert(TestSetOps.toSet(df0).isEmpty)
    // delta at occurrence 1: full (1,2) joins delta (2,3) -> (1,3)
    val df1 = PlanGenerator.compileRule(rule, (_, occ) => if (occ == 1) delta else full)
    assert(TestSetOps.toSet(df1) == Set(Vector(1L, 3L)))
  }
}

private object TestSetOps {
  def toSet(df: DataFrame): Set[Vector[Long]] =
    df.collect().map(r => Vector.tabulate(r.size)(i => r.getLong(i))).toSet
}
