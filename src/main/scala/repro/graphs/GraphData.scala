package repro.graphs

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.types._
import org.apache.spark.sql.Row
import scala.collection.mutable
import scala.util.Random

/** Synthetic graph and program-analysis input generators.
  *
  * These substitute the paper's datasets (§6.2, Table 3):
  *  - [[erdosRenyi]] stands in for the GTgraph Gn-p family (G5K … G80K),
  *  - [[rmat]] stands in for the RMAT-1M … RMAT-128M family and, at a fixed
  *    size, for the real-world graphs (livejournal/orkut/arabic/twitter),
  *  - [[andersenInput]] regenerates the seven synthetic Andersen datasets,
  *  - [[cspaInput]] / [[csdaInput]] stand in for the Graspan inputs
  *    extracted from linux/postgresql/httpd.
  *
  * All generators are deterministic in their (size, seed) arguments. Tuples
  * are `Long`s: active-domain-mapped integers, as in the paper (§5.2 fn. 2).
  */
object GraphData {

  /** In-memory edge list; the common currency between generators and engines. */
  type Edges = Vector[(Long, Long)]

  // ---------------------------------------------------------------- graphs

  /** Erdős–Rényi G(n, p): each ordered pair (u,v), u != v, is an arc with
    * probability p. Stand-in for the paper's dense Gn-p GTgraph family.
    */
  def erdosRenyi(n: Int, p: Double, seed: Long = 42): Edges = {
    val rnd = new Random(seed)
    val out = Vector.newBuilder[(Long, Long)]
    // Geometric skipping: expected O(n^2 p) work instead of O(n^2).
    val logq = math.log1p(-p)
    var idx = -1L
    val total = n.toLong * n
    while ({
      val skip = if (p >= 1.0) 1L else (math.log(1.0 - rnd.nextDouble()) / logq).toLong + 1L
      idx += skip
      idx < total
    }) {
      val u = idx / n
      val v = idx % n
      if (u != v) out += ((u + 1, v + 1)) // 1-based vertex ids
    }
    out.result()
  }

  /** RMAT power-law graph with quadrant probabilities (a,b,c,d); duplicate
    * edges and self-loops are removed. Defaults follow GTgraph's RMAT
    * defaults used by the BigDatalog evaluation.
    */
  def rmat(
      nVertices: Int,
      nEdges: Int,
      seed: Long = 7,
      a: Double = 0.45, b: Double = 0.22, c: Double = 0.22,
  ): Edges = {
    require(nVertices > 0 && (nVertices & (nVertices - 1)) == 0 || nVertices > 0,
      "nVertices must be positive")
    val rnd = new Random(seed)
    val levels = math.max(1, math.ceil(math.log(nVertices.toDouble) / math.log(2.0)).toInt)
    val seen = mutable.HashSet.empty[Long]
    val out = Vector.newBuilder[(Long, Long)]
    var produced = 0
    var attempts = 0
    val maxAttempts = nEdges * 20
    while (produced < nEdges && attempts < maxAttempts) {
      attempts += 1
      var u = 0L; var v = 0L
      var bit = 0
      while (bit < levels) {
        val r = rnd.nextDouble()
        if (r < a) { /* top-left */ }
        else if (r < a + b) { v |= (1L << bit) }
        else if (r < a + b + c) { u |= (1L << bit) }
        else { u |= (1L << bit); v |= (1L << bit) }
        bit += 1
      }
      if (u < nVertices && v < nVertices && u != v) {
        val key = u * nVertices + v
        if (seen.add(key)) { out += ((u + 1, v + 1)); produced += 1 }
      }
    }
    out.result()
  }

  /** Directed chain 1 -> 2 -> … -> n (diameter n-1; worst case for iteration
    * count, used to exercise the CSDA regime).
    */
  def chain(n: Int): Edges = (1 until n).map(i => (i.toLong, i.toLong + 1)).toVector

  /** Complete binary tree with n vertices, arcs parent -> child. */
  def tree(n: Int): Edges =
    (2 to n).map(i => ((i / 2).toLong, i.toLong)).toVector

  /** Weighted variant: attach a deterministic pseudo-random weight in
    * [1, maxW] to every edge (for SSSP).
    */
  def weighted(edges: Edges, maxW: Int = 100, seed: Long = 11): Vector[(Long, Long, Long)] = {
    val rnd = new Random(seed)
    edges.map { case (u, v) => (u, v, rnd.nextInt(maxW).toLong + 1) }
  }

  // --------------------------------------------- program-analysis inputs

  /** Andersen's-analysis input: addressOf/assign/load/store over `nVars`
    * program variables. `scale` follows the paper's datasets 1..7: the
    * active domain and statement counts grow with the scale index.
    */
  final case class AndersenInput(
      addressOf: Edges, assign: Edges, load: Edges, store: Edges) {
    def asMap: Map[String, Edges] =
      Map("addressOf" -> addressOf, "assign" -> assign, "load" -> load, "store" -> store)
  }

  def andersenInput(scale: Int, seed: Long = 13): AndersenInput = {
    require(scale >= 1, "scale starts at 1")
    val nVars = 40 * scale * scale      // active domain grows superlinearly (Fig. 9b)
    val rnd = new Random(seed + scale)
    def v(): Long = rnd.nextInt(nVars).toLong + 1
    def gen(m: Int): Edges = {
      val s = mutable.LinkedHashSet.empty[(Long, Long)]
      while (s.size < m) { val (a, b) = (v(), v()); if (a != b) s += ((a, b)) }
      s.toVector
    }
    AndersenInput(
      addressOf = gen(nVars / 2),
      assign    = gen(nVars),
      load      = gen(nVars / 4),
      store     = gen(nVars / 4),
    )
  }

  /** CSPA input: assign/dereference relations shaped like per-function
    * value-flow clusters (the Graspan linux/postgresql/httpd inputs were
    * exactly such graphs). `nFuncs` clusters of `clusterSize` variables with
    * intra-cluster assigns and sparse dereference edges.
    */
  final case class CspaInput(assign: Edges, dereference: Edges) {
    def asMap: Map[String, Edges] = Map("assign" -> assign, "dereference" -> dereference)
  }

  def cspaInput(nFuncs: Int, clusterSize: Int = 16, seed: Long = 17): CspaInput = {
    val rnd = new Random(seed)
    val assign = Vector.newBuilder[(Long, Long)]
    val deref = Vector.newBuilder[(Long, Long)]
    var base = 1L
    for (_ <- 0 until nFuncs) {
      // intra-cluster assignment chains and cross links
      for (i <- 0 until clusterSize - 1) {
        assign += ((base + i + 1, base + i)) // x_{i+1} := x_i
        if (rnd.nextDouble() < 0.3)
          assign += ((base + rnd.nextInt(clusterSize), base + rnd.nextInt(clusterSize)))
      }
      // sparse dereference edges (pointer -> pointee variable)
      for (_ <- 0 until math.max(1, clusterSize / 4))
        deref += ((base + rnd.nextInt(clusterSize), base + rnd.nextInt(clusterSize)))
      // cross-cluster assigns (calls): every cluster reads from its
      // predecessor, so value flow chains across the whole program and the
      // closure reaches the paper's large-Δ regime (§6.3: CSPA "produc[es]
      // large Δ and intermediate results at each iteration")
      if (base > 1) {
        assign += ((base + rnd.nextInt(clusterSize), base - 1 - rnd.nextInt(clusterSize)))
        if (rnd.nextDouble() < 0.5)
          assign += ((base + rnd.nextInt(clusterSize), base - 1 - rnd.nextInt(clusterSize)))
      }
      base += clusterSize
    }
    CspaInput(
      assign.result().filter { case (a, b) => a != b }.distinct,
      deref.result().distinct)
  }

  /** CSDA input: a long chained control-flow graph with branches plus a seed
    * set of nullEdge facts. `segments` sequential segments of length
    * `segLen` give diameter ≈ segments · segLen — the many-iterations,
    * tiny-delta regime of the paper's linux/postgresql/httpd runs.
    */
  final case class CsdaInput(nullEdge: Edges, arc: Edges) {
    def asMap: Map[String, Edges] = Map("nullEdge" -> nullEdge, "arc" -> arc)
  }

  def csdaInput(segments: Int, segLen: Int = 8, branching: Int = 2, seed: Long = 19): CsdaInput = {
    val rnd = new Random(seed)
    val arc = Vector.newBuilder[(Long, Long)]
    val nulls = Vector.newBuilder[(Long, Long)]
    var id = 1L
    var prevExit = -1L
    for (_ <- 0 until segments) {
      val entry = id
      // `branching` parallel chains of length segLen between entry and exit
      val exit = entry + branching.toLong * segLen + 1
      for (b <- 0 until branching) {
        var cur = entry
        for (j <- 0 until segLen) {
          val nxt = entry + 1 + b.toLong * segLen + j
          arc += ((cur, nxt))
          cur = nxt
        }
        arc += ((cur, exit))
      }
      if (prevExit > 0) arc += ((prevExit, entry))
      // a few null definitions per segment
      nulls += ((entry, entry + 1))
      if (rnd.nextDouble() < 0.5) nulls += ((entry, entry + 1 + segLen))
      prevExit = exit
      id = exit + 1
    }
    CsdaInput(nulls.result().distinct, arc.result().distinct)
  }

  // ----------------------------------------------------------- conversions

  /** Binary edge list -> DataFrame with LongType columns c0, c1. */
  def toDF(spark: SparkSession, edges: Edges): DataFrame =
    tuplesToDF(spark, edges.map(e => Vector(e._1, e._2)), 2)

  /** Weighted edge list -> DataFrame with columns c0, c1, c2. */
  def toDF3(spark: SparkSession, edges: Vector[(Long, Long, Long)]): DataFrame =
    tuplesToDF(spark, edges.map(e => Vector(e._1, e._2, e._3)), 3)

  /** Unary vertex list -> DataFrame with column c0. */
  def toDF1(spark: SparkSession, ids: Vector[Long]): DataFrame =
    tuplesToDF(spark, ids.map(Vector(_)), 1)

  /** Generic tuple list -> DataFrame with LongType columns c0..c{arity-1}. */
  def tuplesToDF(spark: SparkSession, tuples: Seq[Vector[Long]], arity: Int): DataFrame = {
    val schema = StructType((0 until arity).map(i => StructField(s"c$i", LongType, nullable = false)))
    val rows = tuples.map(t => Row.fromSeq(t))
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, math.max(1, math.min(16, tuples.size / 20000 + 1))), schema)
  }
}
