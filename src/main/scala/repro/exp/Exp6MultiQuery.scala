package repro.exp

import repro.sim.MultiQuerySim

/** T6 (paper Fig. 11): aggregate throughput of multiple S2SProbe instances
  * on one data source, for single- and dual-core nodes at the paper's three
  * input scalings (per-query fixed-load-factor CPU demands: 55 % at ×10,
  * 30 % at ×5, 5 % at ×1 — §VI-F).
  */
object Exp6MultiQuery {

  final case class Setting(label: String, perQueryInputMbps: Double, perQueryDemandCores: Double,
                           queryCounts: Vector[Int])

  val settings: Vector[Setting] = Vector(
    Setting("x10", 26.2, 0.55, Vector(1, 2, 3, 4, 6)),
    Setting("x5", 13.1, 0.30, Vector(1, 2, 4, 6, 8)),
    Setting("x1", 2.62, 0.05, Vector(1, 5, 10, 15, 20, 25, 30)),
  )

  val CoreCounts: Vector[Int] = Vector(1, 2)

  def run(s: Setting): Vector[MultiQuerySim.MultiQueryResult] =
    for {
      cores <- CoreCounts
      n <- s.queryCounts
    } yield MultiQuerySim.aggregateThroughput(cores, n, s.perQueryDemandCores, s.perQueryInputMbps)

  final case class MaxQueries(label: String, cores: Int, maxQueries: Int)

  def maxQueries: Vector[MaxQueries] =
    for {
      s <- settings
      cores <- CoreCounts
    } yield MaxQueries(s.label, cores,
      MultiQuerySim.maxSupportedQueries(cores, s.perQueryDemandCores, s.perQueryInputMbps))

  def printAll(): Unit = {
    for (s <- settings) {
      Tab.print(
        s"T6 ${s.label}: multi-query aggregate throughput " +
          s"(per-query ${Tab.f1(s.perQueryInputMbps)} Mbps, demand " +
          s"${(s.perQueryDemandCores * 100).toInt}% core)",
        Seq("cores", "queries", "agg Mbps", "saturated"),
        run(s).map(r => Seq(r.cores.toString, r.nQueries.toString,
          Tab.f1(r.aggThroughputMbps), r.saturated.toString)),
      )
    }
    Tab.print(
      "T6 summary: max queries supported",
      Seq("rate", "cores", "max queries"),
      maxQueries.map(r => Seq(r.label, r.cores.toString, r.maxQueries.toString)),
    )
  }
}
