package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** Shared session builder for the spark-submit entrypoints. */
object JobSession {
  def build(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** T1 (Fig. 7): single-source throughput tables — pure simulator, no Spark
  * needed; kept as a job for uniformity.
  */
object T1ThroughputJob {
  def main(args: Array[String]): Unit = Exp1Throughput.printAll()
}

/** T2 (Fig. 8): convergence scenarios. */
object T2ConvergenceJob {
  def main(args: Array[String]): Unit = Exp2Convergence.printAll()
}

/** T3 (§VI-C): operator-count convergence study. */
object T3OperatorCountJob {
  def main(args: Array[String]): Unit = Exp3OperatorCount.printAll()
}

/** T4 (Fig. 9): data-synopsis comparison — runs WSP sampling on Spark. */
object T4SynopsisJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("jarvis-t4-synopsis")
    try Exp4Synopsis.printAll(spark)
    finally spark.stop()
  }
}

/** T5 (Fig. 10): multi-source scaling. */
object T5ScalingJob {
  def main(args: Array[String]): Unit = Exp5Scaling.printAll()
}

/** T6 (Fig. 11): multiple queries per source. */
object T6MultiQueryJob {
  def main(args: Array[String]): Unit = Exp6MultiQuery.printAll()
}
