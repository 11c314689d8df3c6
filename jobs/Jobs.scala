package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoints, one per reproduced table/figure. Pass `--quick`
  * for a reduced-size smoke run. Example:
  *
  * {{{
  * spark-submit --class repro.jobs.Table4Job repro-jobs.jar
  * }}}
  */
object JobSession {
  def create(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
  def quick(args: Array[String]): Boolean = args.contains("--quick")
}

/** Table 1: capability/behaviour matrix probed on the live engines. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.create("table1")
    Tables.table1(JobSession.quick(args))
    spark.stop()
  }
}

/** Table 3: RecStep across the full program x dataset matrix. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.create("table3")
    Tables.table3(JobSession.quick(args))
    spark.stop()
  }
}

/** Table 4 (Appendix B): CPU efficiency of every system on the eight
  * representative workloads.
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.create("table4")
    Tables.table4(JobSession.quick(args))
    spark.stop()
  }
}

/** Figure 2: per-optimization ablation of RecStep on CSPA. */
object AblationJob {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.create("ablation")
    Tables.ablation(JobSession.quick(args))
    spark.stop()
  }
}
