package repro.graphs

import org.scalatest.funsuite.AnyFunSuite

class GraphDataSpec extends AnyFunSuite {

  test("erdosRenyi is deterministic in seed") {
    assert(GraphData.erdosRenyi(100, 0.05, 1) == GraphData.erdosRenyi(100, 0.05, 1))
    assert(GraphData.erdosRenyi(100, 0.05, 1) != GraphData.erdosRenyi(100, 0.05, 2))
  }

  test("erdosRenyi edge count is near n*n*p") {
    val n = 400; val p = 0.01
    val m = GraphData.erdosRenyi(n, p, 7).size
    val expected = n.toDouble * n * p
    assert(m > expected * 0.8 && m < expected * 1.2, s"got $m, expected ~$expected")
  }

  test("erdosRenyi has no self loops and ids in range") {
    val es = GraphData.erdosRenyi(50, 0.1, 3)
    assert(es.forall { case (u, v) => u != v && u >= 1 && u <= 50 && v >= 1 && v <= 50 })
  }

  test("erdosRenyi has no duplicate edges") {
    val es = GraphData.erdosRenyi(80, 0.1, 5)
    assert(es.size == es.toSet.size)
  }

  test("rmat produces the requested number of distinct edges") {
    val es = GraphData.rmat(1024, 5000, 1)
    assert(es.size == 5000)
    assert(es.toSet.size == 5000)
    assert(es.forall { case (u, v) => u >= 1 && u <= 1024 && v >= 1 && v <= 1024 && u != v })
  }

  test("rmat is deterministic and skewed") {
    assert(GraphData.rmat(512, 2000, 9) == GraphData.rmat(512, 2000, 9))
    val es = GraphData.rmat(1024, 8000, 2)
    val outDeg = es.groupBy(_._1).map(_._2.size)
    // power-law-ish: the max out-degree far exceeds the mean
    assert(outDeg.max > 4 * (es.size.toDouble / outDeg.size))
  }

  test("chain has diameter n-1") {
    val es = GraphData.chain(10)
    assert(es.size == 9)
    assert(es == (1 until 10).map(i => (i.toLong, i.toLong + 1)).toVector)
  }

  test("tree has n-1 edges from parents to children") {
    val es = GraphData.tree(15)
    assert(es.size == 14)
    assert(es.forall { case (p, c) => p == c / 2 })
  }

  test("weighted attaches deterministic weights in [1, maxW]") {
    val es = GraphData.weighted(GraphData.chain(20), maxW = 10, seed = 4)
    assert(es.forall(e => e._3 >= 1 && e._3 <= 10))
    assert(es == GraphData.weighted(GraphData.chain(20), maxW = 10, seed = 4))
  }

  test("andersenInput grows with scale") {
    val a1 = GraphData.andersenInput(1)
    val a3 = GraphData.andersenInput(3)
    assert(a3.assign.size > a1.assign.size)
    assert(a3.addressOf.size > a1.addressOf.size)
    assert(a1.asMap.keySet == Set("addressOf", "assign", "load", "store"))
  }

  test("andersenInput values are positive and deterministic") {
    val a = GraphData.andersenInput(2)
    assert(a.asMap.values.flatten.forall { case (x, y) => x >= 1 && y >= 1 })
    assert(GraphData.andersenInput(2).assign == a.assign)
  }

  test("cspaInput produces distinct positive edges") {
    val c = GraphData.cspaInput(10)
    assert(c.assign.nonEmpty && c.dereference.nonEmpty)
    assert(c.assign.distinct == c.assign)
    assert(c.assign.forall { case (a, b) => a != b && a >= 1 && b >= 1 })
  }

  test("csdaInput has a long-diameter CFG") {
    val c = GraphData.csdaInput(segments = 5, segLen = 4)
    assert(c.arc.nonEmpty && c.nullEdge.nonEmpty)
    // all vertices positive, arcs distinct
    assert(c.arc.distinct == c.arc)
    assert(c.arc.forall { case (u, v) => u >= 1 && v >= 1 })
  }

  test("csdaInput diameter scales with segments") {
    // propagate from vertex 1 along arcs; max hops should exceed segments*segLen
    val c = GraphData.csdaInput(segments = 6, segLen = 5)
    val adj = c.arc.groupBy(_._1)
    var frontier = Set(1L); var seen = Set(1L); var hops = 0
    while (frontier.nonEmpty && hops < 10000) {
      frontier = frontier.flatMap(u => adj.getOrElse(u, Vector.empty).map(_._2)) -- seen
      seen ++= frontier; hops += 1
    }
    assert(hops >= 6 * 5, s"diameter only $hops")
  }
}
