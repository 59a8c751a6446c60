package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench._

/** spark-submit entrypoints — one object per evaluation table group.
  * Example:
  *   spark-submit --class repro.jobs.TpchTablesJob target/scala-2.13/repro_*.jar 0.1
  * Arguments default to the bench-suite scales (see DESIGN.md).
  */
object JobSession {
  def spark(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
  def arg(args: Array[String], i: Int, default: Double): Double =
    if (args.length > i) args(i).toDouble else default
}

/** Tables T1/T2/T3/T8 (Figs. 9, 11a/d, 11b/e, 14) + T4 (Fig. 11c). */
object TpchTablesJob {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark("pbds-tpch")
    val sf = JobSession.arg(args, 0, 0.1)
    TpchExperiments.run(s, sf, fragCounts = Seq(64, 1024, 8192))
    TpchExperiments.decodeComparison(s, sf, nFrags = 1024)
    s.stop()
  }
}

/** Table T5 (Fig. 11f–i, MonetDB analog). */
object MemTableJob {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark("pbds-mem")
    MemExperiments.run(s, JobSession.arg(args, 0, 0.1), fragCounts = Seq(256, 1024))
    s.stop()
  }
}

/** Tables T6/T7 (Fig. 12 capture optimizations). */
object CaptureOptTableJob {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark("pbds-captureopt")
    CaptureOptExperiments.run(s, JobSession.arg(args, 0, 0.02),
      JobSession.arg(args, 1, 0.05), fragCounts = Seq(64, 512, 2048))
    s.stop()
  }
}

/** Tables T9/T10 (Fig. 10 real-world datasets). */
object RealWorldTableJob {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark("pbds-realworld")
    RealWorldExperiments.run(s, JobSession.arg(args, 0, 0.15),
      JobSession.arg(args, 1, 0.1), JobSession.arg(args, 2, 0.05))
    s.stop()
  }
}

/** Table T11 (Fig. 13 end-to-end self-tuning). */
object EndToEndTableJob {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark("pbds-endtoend")
    EndToEndExperiments.run(s, JobSession.arg(args, 0, 0.02),
      JobSession.arg(args, 1, 0.01), nQueries = JobSession.arg(args, 2, 100).toInt)
    s.stop()
  }
}

/** Table T12 (Sec. 9.5 safety/reuse check cost). */
object CheckOverheadTableJob {
  def main(args: Array[String]): Unit = {
    CheckOverheadExperiments.run()
  }
}
