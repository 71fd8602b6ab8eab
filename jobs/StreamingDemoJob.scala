package repro.jobs

import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.IntegerType
import org.apache.spark.sql.DataFrame
import repro.core.adapt.JarvisRuntime
import repro.core.model.{OpKind, OperatorSpec, QuerySpec}
import repro.dataflow.EpochSparkDriver

/** Structured-Streaming demonstration of the Jarvis mapping (DESIGN.md §2):
  * a rate source shaped into Pingmesh records, processed by the *same*
  * data-level partitioned plan as the batch path via `foreachBatch`
  * (micro-batch = epoch), with a Jarvis runtime adapting load factors from
  * batch to batch under a simulated CPU budget that changes mid-run.
  *
  *   spark-submit --class repro.jobs.StreamingDemoJob target/.../repro*.jar [numBatches]
  */
object StreamingDemoJob {

  /** Shape rate-source rows into the Pingmesh schema. */
  def shape(rate: DataFrame): DataFrame =
    rate.select(
      col("value") as "recId",
      (col("value") % 16) as "srcIp",
      (col("value") * 7 % 1000) as "ts",
      pmod(xxhash64(col("value"), lit(1L)), lit(64L)) as "dstIp",
      lit(0L) as "srcCluster",
      lit(0L) as "dstCluster",
      (pmod(xxhash64(col("value"), lit(2L)), lit(1000L)) / 1000.0 * 1.3 + 0.2) as "rtt",
      when(pmod(xxhash64(col("value"), lit(3L)), lit(100L)) < 14,
        (pmod(xxhash64(col("value"), lit(4L)), lit(3L)) + 1).cast(IntegerType))
        .otherwise(lit(0).cast(IntegerType)) as "errCode",
    )

  def main(args: Array[String]): Unit = {
    val numBatches = args.headOption.map(_.toInt).getOrElse(12)
    val spark = JobSession.build("jarvis-streaming-demo")

    // S2SProbe spec scaled to the live stream (~5000 rec/s): the full
    // pipeline demands ~0.85 cores at that rate, so a 0.3-core budget forces
    // a partial data-level plan and the mid-run raise to 0.9 re-adapts it.
    val streamRate = 5000.0
    val streamSpec = QuerySpec("S2SProbe-stream", Vector(
      OperatorSpec("F", OpKind.Filter, 0.13 / streamRate, 0.86, 86, 86),
      OperatorSpec("G+R", OpKind.GroupReduce, 0.72 / (0.86 * streamRate), 1.0, 86, 86,
        groupCount = 2000, windowEpochs = 10),
    ), 86, streamRate)

    // The runtime + driver pair adapts per epoch; foreachBatch feeds the
    // driver the live micro-batch instead of a generated one.
    var currentBatch: DataFrame = spark.emptyDataFrame
    val driver = new EpochSparkDriver(spark, streamSpec, _ => currentBatch, budgetCores = 0.30)
    val runtime = new JarvisRuntime(driver)

    val stream = spark.readStream
      .format("rate")
      .option("rowsPerSecond", 5000)
      .load()

    val query = shape(stream).writeStream
      .outputMode("append")
      .foreachBatch { (batch: org.apache.spark.sql.Dataset[org.apache.spark.sql.Row], id: Long) =>
        currentBatch = batch.toDF()
        if (id == numBatches / 2) driver.budgetCores = 0.90 // mid-run resource change
        val entry = runtime.step()
        val out = driver.lastResult.map(_.count()).getOrElse(0L)
        println(f"[epoch $id%3d] phase=${entry.phase} state=${entry.state} " +
          f"p=${entry.p.map(x => f"$x%.2f").mkString("[", ",", "]")} resultRows=$out")
        ()
      }
      .start()

    // Let the demo run for ~numBatches seconds of micro-batches.
    var waited = 0
    while (query.isActive && driver.currentEpoch < numBatches && waited < 10 * numBatches) {
      query.awaitTermination(1000)
      waited += 1
    }
    query.stop()
    println(s"final load factors: ${runtime.loadFactors.mkString("[", ", ", "]")}")
    spark.stop()
  }
}
