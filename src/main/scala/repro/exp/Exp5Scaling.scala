package repro.exp

import repro.core.model.Calibration
import repro.core.strategy.PartitionStrategy
import repro.sim.ClusterSim

/** T5 (paper Fig. 10 + the "Query latency" paragraph): aggregate throughput
  * and epoch latency as data sources scale, Jarvis vs Best-OP, at the
  * paper's three rate/budget settings:
  * ×10 (26.2 Mbps, 55 % CPU), ×5 (13.1 Mbps, 30 % CPU), ×1 (2.62 Mbps, 5 %).
  */
object Exp5Scaling {

  final case class Setting(label: String, inputMbps: Double, budgetCores: Double,
                           sourceCounts: Vector[Int])

  val settings: Vector[Setting] = Vector(
    Setting("x10", 26.2, 0.55, Vector(4, 8, 16, 24, 32, 48, 64, 96)),
    Setting("x5", 13.1, 0.30, Vector(10, 20, 40, 60, 80, 120, 160)),
    Setting("x1", 2.62, 0.05, Vector(40, 80, 120, 180, 250)),
  )

  val strategies: Vector[PartitionStrategy] =
    Vector(PartitionStrategy.BestOp, PartitionStrategy.Jarvis)

  def run(s: Setting): Vector[ClusterSim.ScalingResult] =
    for {
      n <- s.sourceCounts
      st <- strategies
    } yield ClusterSim.multiSourceThroughput(
      Calibration.s2sProbe, st, s.budgetCores, s.inputMbps, n)

  final case class MaxSources(label: String, strategy: String, maxSources: Int)

  def maxSources: Vector[MaxSources] =
    for {
      s <- settings
      st <- strategies
    } yield MaxSources(s.label, st.name,
      ClusterSim.maxSupportedSources(Calibration.s2sProbe, st, s.budgetCores, s.inputMbps))

  def printAll(): Unit = {
    for (s <- settings) {
      val rows = run(s)
      Tab.print(
        s"T5 ${s.label}: S2SProbe scaling (input ${Tab.f1(s.inputMbps)} Mbps/src, " +
          s"CPU ${(s.budgetCores * 100).toInt}%)",
        Seq("sources", "strategy", "agg Mbps", "net Mbps/src", "link util",
          "median lat ms", "max lat ms"),
        rows.map(r => Seq(r.nSources.toString, r.strategy, Tab.f1(r.aggThroughputMbps),
          Tab.f1(r.perSourceNetMbps), Tab.f2(r.linkUtilization),
          Tab.f1(r.medianLatencyMs), Tab.f1(r.maxLatencyMs))),
      )
    }
    Tab.print(
      "T5 summary: max sources supported without throughput degradation",
      Seq("rate", "strategy", "max sources"),
      maxSources.map(r => Seq(r.label, r.strategy, r.maxSources.toString)),
    )
  }
}
