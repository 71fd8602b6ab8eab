package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.model.Calibration
import repro.core.strategy.PartitionStrategy
import repro.exp.Exp5Scaling
import repro.sim.ClusterSim

/** T5 — paper Fig. 10 + "Query latency": multi-source scaling of Jarvis vs
  * Best-OP at the paper's three rate/budget settings, plus epoch latency
  * under load.
  */
class T5ScalingBench extends AnyFunSuite {

  private lazy val maxSrc = Exp5Scaling.maxSources
  private def ms(label: String, strategy: String): Int =
    maxSrc.find(r => r.label == label && r.strategy == strategy).get.maxSources

  test("print T5 tables (Fig. 10)") {
    Exp5Scaling.printAll()
    assert(maxSrc.size == 6)
  }

  test("x10: Jarvis scales to far more sources than Best-OP (paper: 32 vs <8)") {
    val j = ms("x10", "Jarvis"); val b = ms("x10", "Best-OP")
    info(s"Jarvis=$j Best-OP=$b (paper: Jarvis 32, Best-OP degrades immediately)")
    assert(j >= 30, s"jarvis=$j")
    assert(j >= 1.5 * b, s"jarvis=$j bestop=$b")
  }

  test("x5: Jarvis supports ~75% more sources than Best-OP (paper: 70 vs 40)") {
    val j = ms("x5", "Jarvis"); val b = ms("x5", "Best-OP")
    info(s"Jarvis=$j Best-OP=$b (paper: 70 vs 40, +75%)")
    assert(j.toDouble / b >= 1.5, s"jarvis=$j bestop=$b")
  }

  test("x1: Jarvis scales to 250 sources (paper); Best-OP degrades earlier (paper: 180)") {
    val j = ms("x1", "Jarvis"); val b = ms("x1", "Best-OP")
    info(s"Jarvis=$j Best-OP=$b (paper: 250+ vs 180)")
    assert(j >= 250, s"jarvis=$j")
    assert(b < j, s"bestop=$b")
    assert(b >= 100, s"bestop=$b")
  }

  test("throughput scales linearly for Jarvis until its cap") {
    val r16 = ClusterSim.multiSourceThroughput(Calibration.s2sProbe,
      PartitionStrategy.Jarvis, 0.55, 26.2, 16)
    assert(math.abs(r16.aggThroughputMbps - 16 * 26.2) < 0.5)
  }

  test("Best-OP hits the network wall early at x10 (agg throughput flattens)") {
    val r40 = ClusterSim.multiSourceThroughput(Calibration.s2sProbe,
      PartitionStrategy.BestOp, 0.55, 26.2, 40)
    assert(r40.aggThroughputMbps < 40 * 26.2 * 0.7, s"${r40.aggThroughputMbps}")
  }

  test("latency: Jarvis median well below Best-OP at matched x5 load (paper: 0.5s vs 1.8s)") {
    val j = ClusterSim.multiSourceThroughput(Calibration.s2sProbe,
      PartitionStrategy.Jarvis, 0.30, 13.1, 40)
    val b = ClusterSim.multiSourceThroughput(Calibration.s2sProbe,
      PartitionStrategy.BestOp, 0.30, 13.1, 40)
    info(f"median: Jarvis ${j.medianLatencyMs}%.0f ms vs Best-OP ${b.medianLatencyMs}%.0f ms " +
      f"(paper: 500 vs 1800); max: ${j.maxLatencyMs}%.0f vs ${b.maxLatencyMs}%.0f ms (paper: 2000 vs 5000)")
    assert(j.medianLatencyMs * 2 <= b.medianLatencyMs,
      s"jarvis=${j.medianLatencyMs} bestop=${b.medianLatencyMs}")
    assert(j.medianLatencyMs < 1000.0)
  }

  test("latency: Best-OP exceeds 60s when network-bottlenecked; Jarvis stays under 5s (paper)") {
    val j = ClusterSim.multiSourceThroughput(Calibration.s2sProbe,
      PartitionStrategy.Jarvis, 0.30, 13.1, 60)
    val b = ClusterSim.multiSourceThroughput(Calibration.s2sProbe,
      PartitionStrategy.BestOp, 0.30, 13.1, 60)
    assert(b.medianLatencyMs >= 60e3, s"bestop=${b.medianLatencyMs}")
    assert(j.maxLatencyMs <= 5000.0, s"jarvis max=${j.maxLatencyMs}")
  }
}
