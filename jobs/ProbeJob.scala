package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.{Harness, Workloads}
import repro.core._

/** Ad-hoc arm-by-arm probe of RecStep configurations on one workload —
  * used to attribute per-iteration overheads (not part of any table).
  * Usage: runMain repro.jobs.ProbeJob [REACH|CSPA|TC]
  */
object ProbeJob {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.create("probe")
    if (args.headOption.contains("CSPAHH")) { cspaHeadToHead(); spark.stop(); return }
    val w = args.headOption.getOrElse("REACH") match {
      case "CSPA" => Workloads.cspaHttpd
      case "TC"   => Workloads.tcOn("G1K", "G20K", 1000, 0.01).copy(name = "TCrel(G1K)")
      case _      => Workloads.reachOn("orkut-sub", "orkut", Workloads.orkutN)
    }
    val base = RecStepConf()
    val arms = Seq(
      "default        " -> base,
      "dsd=opsd       " -> base.copy(dsd = DsdMode.Opsd),
      "fastDedup=off  " -> base.copy(fastDedup = false),
      "opsd+nofdedup  " -> base.copy(dsd = DsdMode.Opsd, fastDedup = false),
      "uie=off        " -> base.copy(uie = false),
      "bigdatalog-conf" -> base.copy(uie = false, dsd = DsdMode.Opsd, fastDedup = false),
    )
    for ((name, conf) <- arms) {
      val r = Harness.run(new RecStepEngine(conf), w, timeoutSec = 300)
      println(s"PROBE $name -> ${r.status.cell.trim}")
    }
    spark.stop()
  }

  /** CSPA(linux-a) head-to-head with fair per-engine warmup. */
  private def cspaHeadToHead()(implicit spark: SparkSession): Unit = {
    import repro.baselines.souffle.SouffleLite
    import repro.baselines.graspan.GraspanLite
    val w = Workloads.cspaLinux
    repro.bench.Tables.warmJvm()
    for (_ <- 1 to 2; (n, mk) <- Seq(
        "souffle" -> (() => new SouffleLite(): repro.core.DatalogEngine),
        "recstep" -> (() => new RecStepEngine(RecStepConf.default): repro.core.DatalogEngine),
        "graspan" -> (() => new GraspanLite(): repro.core.DatalogEngine))) {
      val r = Harness.run(mk(), w, timeoutSec = 420)
      println(s"PROBE cspa $n -> ${r.status.cell.trim} " + (r.status match {
        case ok: Harness.Ok => s"size=${ok.resultSize}"
        case _ => ""
      }))
    }
  }
}
