package repro.exp

import repro.core.adapt.{JarvisRuntime, Phase, PipelineState, RuntimeConfig}
import repro.core.model.{Calibration, QuerySpec}
import repro.sim.SourceNodeSim

/** T2 (paper Fig. 8): convergence of Jarvis vs `LP only` vs `w/o LP-init`
  * after resource-condition changes, on scripted scenarios mirroring the
  * paper's: budget steps for S2SProbe/LogAnalytics, budget + join-table-size
  * steps for T2TProbe. Convergence is counted in Adapt-phase epochs (the
  * three change-detection epochs are reported separately, as in §VI-C).
  */
object Exp2Convergence {

  /** A scheduled change applied before the given epoch index. */
  final case class Change(atEpoch: Int, label: String, apply: SourceNodeSim => Unit)

  final case class Scenario(name: String, spec: QuerySpec, inputRate: Double,
                            initialBudget: Double, changes: Vector[Change], totalEpochs: Int)

  def s2sScenario: Scenario = Scenario(
    name = "S2SProbe",
    spec = Calibration.s2sProbe,
    inputRate = Calibration.PingmeshRecsPerSec,
    initialBudget = 0.10,
    changes = Vector(
      Change(3, "10%->90% CPU", _.budgetCores = 0.90),
      Change(18, "90%->60% CPU", _.budgetCores = 0.60),
    ),
    totalEpochs = 36,
  )

  def t2tScenario: Scenario = Scenario(
    name = "T2TProbe",
    spec = Calibration.t2tProbe(50),
    inputRate = Calibration.PingmeshRecsPerSec,
    initialBudget = 0.10,
    changes = Vector(
      Change(3, "10%->100% CPU (table 50)", _.budgetCores = 1.00),
      Change(22, "table 50->500", _.setSpec(Calibration.t2tProbe(500))),
    ),
    totalEpochs = 44,
  )

  def logScenario: Scenario = Scenario(
    name = "LogAnalytics",
    spec = Calibration.logAnalytics,
    inputRate = Calibration.LogRecsPerSec,
    initialBudget = 0.05,
    changes = Vector(
      Change(3, "5%->30% CPU", _.budgetCores = 0.30),
      Change(18, "30%->15% CPU", _.budgetCores = 0.15),
    ),
    totalEpochs = 36,
  )

  val variants: Vector[(String, RuntimeConfig)] = Vector(
    ("Jarvis", RuntimeConfig.Jarvis),
    ("LP only", RuntimeConfig.LpOnly),
    ("w/o LP-init", RuntimeConfig.NoLpInit),
  )

  /** Result for one (scenario change, variant): Adapt epochs to stability,
    * or None if the variant never restabilized before the next change/end.
    */
  final case class ConvergenceRow(scenario: String, change: String, variant: String,
                                  adaptEpochs: Option[Int])

  def run(sc: Scenario): Vector[ConvergenceRow] =
    variants.flatMap { case (vname, cfg) =>
      val sim = new SourceNodeSim(sc.spec, sc.initialBudget, sc.inputRate)
      val rt = new JarvisRuntime(sim, cfg)
      // Epoch 0 runs Startup; changes land before their scheduled epoch.
      val changeAt = sc.changes.map(c => c.atEpoch -> c).toMap
      for (ep <- 0 until sc.totalEpochs) {
        changeAt.get(ep).foreach(_.apply(sim))
        rt.step()
      }
      val log = rt.log
      // Attribute each completed adaptation (Adapt -> Stable transition) to
      // the most recent change before its Profile epoch.
      val profileEpochs = log.filter(_.phase == Phase.Profile).map(_.epoch)
      val stableAfterAdapt = log.filter(l =>
        l.phase == Phase.Adapt && l.state == PipelineState.Stable).map(_.epoch)
      sc.changes.map { ch =>
        // The Profile triggered by this change is the first at/after it.
        val nextChange = sc.changes.map(_.atEpoch).find(_ > ch.atEpoch).getOrElse(Int.MaxValue)
        val profile = profileEpochs.find(e => e >= ch.atEpoch && e < nextChange)
        val conv = profile.flatMap { pe =>
          stableAfterAdapt.find(e => e > pe && e < nextChange).map(_ - pe)
        }
        ConvergenceRow(sc.name, ch.label, vname, conv)
      }
    }

  def scenarios: Vector[Scenario] = Vector(s2sScenario, t2tScenario, logScenario)

  def printAll(): Unit = {
    val rows = scenarios.flatMap(run)
    Tab.print(
      "T2: convergence after resource changes (Adapt epochs; +3 detection epochs, +1 profile epoch)",
      Seq("query", "change", "variant", "adapt epochs"),
      rows.map(r => Seq(r.scenario, r.change, r.variant,
        r.adaptEpochs.map(_.toString).getOrElse("not converged"))),
    )
  }
}
