package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.datalog.Program
import repro.graphs.GraphData
import repro.programs.Programs

/** Benchmark workloads: (program, dataset) pairs mirroring the paper's
  * Table 3 matrix at a scale that completes on one 16-core node in minutes.
  * Every dataset is a synthetic stand-in documented in DESIGN.md §3 — the
  * name records which paper dataset it substitutes.
  */
object Workloads {

  final case class Workload(
      /** Short id, e.g. "TC(G1K)". */
      name: String,
      /** The paper dataset this stands in for, e.g. "G20K". */
      paperDataset: String,
      program: Program,
      /** IDB whose cardinality is reported as the result size. */
      primaryIdb: String,
      edb: SparkSession => Map[String, DataFrame],
  )

  private def arcOf(edges: GraphData.Edges)(spark: SparkSession): Map[String, DataFrame] =
    Map("arc" -> GraphData.toDF(spark, edges))

  private def reachEdb(edges: GraphData.Edges, src: Long)(spark: SparkSession) =
    Map("arc" -> GraphData.toDF(spark, edges), "id" -> GraphData.toDF1(spark, Vector(src)))

  private def ssspEdb(edges: GraphData.Edges, src: Long)(spark: SparkSession) =
    Map("arc" -> GraphData.toDF3(spark, GraphData.weighted(edges, maxW = 100, seed = 21)),
        "id" -> GraphData.toDF1(spark, Vector(src)))

  // ------------------------------------------------------ dense Gn graphs
  // 1/10-scale stand-ins for GTgraph Gn-p (G5K..G80K, mean degree 5-10).

  def gnp(n: Int, p: Double): GraphData.Edges = GraphData.erdosRenyi(n, p, seed = 42)

  def tcOn(tag: String, paper: String, n: Int, p: Double): Workload =
    Workload(s"TC($tag)", paper, Programs.tc, "tc", arcOf(gnp(n, p)))

  def sgOn(tag: String, paper: String, n: Int, p: Double): Workload =
    Workload(s"SG($tag)", paper, Programs.sg, "sg", arcOf(gnp(n, p)))

  /** The Gn sweep of Table 3 (scaled 1:10 from G5K..G20K). */
  val tcSweep: Seq[Workload] = Seq(
    tcOn("G500", "G5K", 500, 0.01),
    tcOn("G1K", "G10K", 1000, 0.01),
    tcOn("G1K-0.02", "G10K-0.01", 1000, 0.02),
    tcOn("G2K", "G20K", 2000, 0.01),
  )
  val sgSweep: Seq[Workload] = Seq(
    sgOn("G300", "G5K", 300, 0.01),
    sgOn("G500", "G10K", 500, 0.01),
    sgOn("G800", "G20K", 800, 0.01),
  )

  // ----------------------------------------------------------- RMAT family
  // stand-ins for RMAT-1M..128M (10n edges) and the real-world graphs.

  def rmatEdges(n: Int): GraphData.Edges = GraphData.rmat(n, 10 * n, seed = 7)

  def reachOn(tag: String, paper: String, n: Int): Workload =
    Workload(s"REACH($tag)", paper, Programs.reach, "reach", reachEdb(rmatEdges(n), src = 1))
  def ccOn(tag: String, paper: String, n: Int): Workload =
    Workload(s"CC($tag)", paper, Programs.cc, "cc3", arcOf(rmatEdges(n)))
  def ssspOn(tag: String, paper: String, n: Int): Workload =
    Workload(s"SSSP($tag)", paper, Programs.sssp, "sssp", ssspEdb(rmatEdges(n), src = 1))

  val rmatSweep: Seq[Int] = Seq(8192, 16384, 32768)

  /** "orkut-sub": the fixed real-world-graph stand-in. */
  val orkutN = 32768

  // ---------------------------------------------------- program analysis

  def aaOn(scale: Int): Workload =
    Workload(s"AA(ds$scale)", s"dataset $scale", Programs.andersen, "pointsTo",
      spark => GraphData.andersenInput(scale).asMap
        .map { case (k, v) => k -> GraphData.toDF(spark, v) })

  /** CSPA stand-ins for httpd/postgresql/linux (growing sizes). */
  def cspaOn(tag: String, nFuncs: Int, clusterSize: Int): Workload =
    Workload(s"CSPA($tag)", tag.stripSuffix("-a"), Programs.cspa, "valueFlow",
      spark => {
        val in = GraphData.cspaInput(nFuncs, clusterSize, seed = 17)
        Map("assign" -> GraphData.toDF(spark, in.assign),
            "dereference" -> GraphData.toDF(spark, in.dereference))
      })

  /** CSDA stand-ins: long-diameter CFGs (many tiny iterations). */
  def csdaOn(tag: String, segments: Int): Workload =
    Workload(s"CSDA($tag)", tag.stripSuffix("-a"), Programs.csda, "null",
      spark => {
        val in = GraphData.csdaInput(segments, segLen = 6, branching = 2, seed = 19)
        Map("nullEdge" -> GraphData.toDF(spark, in.nullEdge),
            "arc" -> GraphData.toDF(spark, in.arc))
      })

  val cspaHttpd: Workload = cspaOn("httpd-a", nFuncs = 60, clusterSize = 12)
  val cspaPostgres: Workload = cspaOn("postgresql-a", nFuncs = 120, clusterSize = 12)
  val cspaLinux: Workload = cspaOn("linux-a", nFuncs = 200, clusterSize = 12)

  val csdaHttpd: Workload = csdaOn("httpd-a", segments = 12)
  val csdaPostgres: Workload = csdaOn("postgresql-a", segments = 24)
  val csdaLinux: Workload = csdaOn("linux-a", segments = 40)

  // --------------------------------------------- Table 4 representatives

  /** The eight representative workloads of Appendix-B Table 4 (scaled). */
  val table4: Seq[Workload] = Seq(
    tcOn("G1K", "G20K", 1000, 0.01),
    sgOn("G400", "G10K", 400, 0.01),
    reachOn("orkut-sub", "orkut", orkutN),
    ccOn("orkut-sub", "orkut", orkutN),
    ssspOn("orkut-sub", "orkut", orkutN),
    aaOn(7),
    csdaLinux.copy(name = "CSDA(linux-a)"),
    cspaLinux.copy(name = "CSPA(linux-a)"),
  )

  /** Reduced-size variants for smoke tests of the bench harness itself. */
  val quickTable4: Seq[Workload] = Seq(
    tcOn("G200", "G20K", 200, 0.02),
    sgOn("G150", "G10K", 150, 0.02),
    reachOn("rmat-2k", "orkut", 2048),
    ccOn("rmat-2k", "orkut", 2048),
    ssspOn("rmat-2k", "orkut", 2048),
    aaOn(2),
    csdaOn("quick", segments = 4).copy(name = "CSDA(quick)"),
    cspaOn("quick", nFuncs = 8, clusterSize = 8).copy(name = "CSPA(quick)"),
  )
}
