package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.BenchTables

/** spark-submit entrypoints, one per reproduced table.
  *
  * Example:
  *   spark-submit --class repro.jobs.Table3Job repro-jobs.jar
  * or locally: sbt "jobs/runMain repro.jobs.Table3Job"
  */
object Jobs {
  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}

/** Table 1: dataset profiles. */
object Table1Job {
  def main(args: Array[String]): Unit = { BenchTables.table1(); () }
}

/** Table 2: Crystal index sizes vs data-graph files. */
object Table2Job {
  def main(args: Array[String]): Unit = { BenchTables.table2(); () }
}

/** Table 3: EL vs ET compression on RoadNet. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("rads-table3")
    try BenchTables.compressionTable(spark, "RoadNet", 3)
    finally spark.stop()
  }
}

/** Table 4: EL vs ET compression on DBLP. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("rads-table4")
    try BenchTables.compressionTable(spark, "DBLP", 4)
    finally spark.stop()
  }
}

/** Figures 8–11 shape: full five-engine performance comparison.
  * Optional args: dataset names to restrict to (e.g. "RoadNet DBLP").
  */
object PerfJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("rads-perf")
    val ds = if (args.nonEmpty) args.toSeq else repro.bench.BenchData.names
    try BenchTables.perfComparison(spark, ds)
    finally spark.stop()
  }
}

/** Appendix C.2 shape: execution-plan effectiveness. */
object PlanJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("rads-plan")
    try BenchTables.planEffectiveness(spark, if (args.nonEmpty) args(0) else "DBLP")
    finally spark.stop()
  }
}
