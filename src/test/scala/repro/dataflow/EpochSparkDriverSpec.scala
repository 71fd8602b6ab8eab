package repro.dataflow

import org.apache.spark.sql.DataFrame
import repro.core.adapt.{JarvisRuntime, Phase}
import repro.core.model.{OpKind, OperatorSpec, QuerySpec}
import repro.{DfCompare, SparkSpec}

/** The Jarvis control loop driving *real Spark execution* epoch by epoch:
  * load factors adapt to a (simulated) budget while every epoch's
  * partitioned result stays identical to the full query — losslessness
  * holds even mid-adaptation.
  */
class EpochSparkDriverSpec extends SparkSpec {

  /** S2S-shaped spec scaled to the tiny test stream: 200 records/epoch,
    * full pipeline demand = 0.85 cores at that rate.
    */
  private val RecsPerEpoch = 200.0
  private val testSpec: QuerySpec = {
    val f = OperatorSpec("F", OpKind.Filter,
      costSecPerRec = 0.13 / RecsPerEpoch, recRelay = 0.86,
      bytesInPerRec = 86, bytesOutPerRec = 86)
    val gr = OperatorSpec("G+R", OpKind.GroupReduce,
      costSecPerRec = 0.72 / (0.86 * RecsPerEpoch), recRelay = 1.0,
      bytesInPerRec = 86, bytesOutPerRec = 120, groupCount = 2000, windowEpochs = 10)
    QuerySpec("S2SProbe-test", Vector(f, gr), 86, RecsPerEpoch)
  }

  private def batchFor(epoch: Int): DataFrame =
    MonitoringData.pingmesh(spark, nSources = 4, nPeers = 16, nEpochs = 1,
      probesPerEpoch = 50, seed = 1000L + epoch)

  private def newDriver(budget: Double) = new EpochSparkDriver(spark, testSpec, batchFor, budget)

  test("zero load factors observe the full stream at proxy 1 and nothing local") {
    val d = newDriver(0.5)
    val obs = d.runEpoch(Vector(0.0, 0.0))
    assert(obs.proxies(0).incoming == 200.0)
    assert(obs.proxies(0).intended == 0.0)
    assert(obs.cpuDemand == 0.0)
    assert(obs.drainedBytes == 200 * 86.0)
  }

  test("full load factors process everything within an ample budget") {
    val d = newDriver(1.0)
    val obs = d.runEpoch(Vector(1.0, 1.0))
    assert(obs.proxies(0).intended == 200.0)
    assert(obs.proxies(0).forcedDrain < 1e-9)
    assert(obs.cpuDemand > 0.7 && obs.cpuDemand < 1.0, s"demand=${obs.cpuDemand}")
  }

  test("measured lane counts track the load factors") {
    val d = newDriver(1.0)
    val obs = d.runEpoch(Vector(1.0, 0.5))
    val gr = obs.proxies(1)
    // ~86% survive F; about half of those go local.
    assert(gr.incoming > 140 && gr.incoming < 200, s"incoming=${gr.incoming}")
    assert(gr.intended < gr.incoming * 0.7, s"intended=${gr.intended}")
  }

  test("profile epoch measures the real filter relay") {
    val est = newDriver(1.0).runProfileEpoch()
    assert(est.recRelays(0) > 0.78 && est.recRelays(0) < 0.94, s"relay=${est.recRelays(0)}")
  }

  test("the control loop converges on Spark and stays lossless throughout") {
    val d = newDriver(0.9)
    val rt = new JarvisRuntime(d)
    for (_ <- 0 until 10) {
      rt.step()
      // Every epoch's partitioned output equals the full query on that batch.
      (d.lastResult, d.lastBatch) match {
        case (Some(res), Some(batch)) =>
          DfCompare.assertSameRows(res, Queries.s2sFull(batch), "mid-adaptation epoch")
        case _ => // profile epochs produce no result
      }
    }
    assert(rt.convergences.nonEmpty, s"log=${rt.log.map(l => (l.phase, l.state))}")
    assert(rt.loadFactors.forall(_ > 0.9), s"p=${rt.loadFactors}")
  }

  test("a budget drop re-adapts to a partial plan on Spark") {
    val d = newDriver(0.9)
    val rt = new JarvisRuntime(d)
    rt.run(10)
    d.budgetCores = 0.5
    rt.run(14)
    assert(rt.convergences.size >= 2, s"phases=${rt.log.map(_.phase)}")
    assert(rt.loadFactors.exists(_ < 1.0), s"p=${rt.loadFactors}")
    // Final plan fits the reduced budget.
    val obs = d.runEpoch(rt.loadFactors)
    assert(obs.cpuDemand <= obs.cpuBudget * 1.1, s"demand=${obs.cpuDemand}")
  }

  test("profile epochs appear in the phase log") {
    val d = newDriver(0.9)
    val rt = new JarvisRuntime(d)
    rt.run(8)
    assert(rt.log.exists(_.phase == Phase.Profile))
  }
}
