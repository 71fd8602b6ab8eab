package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.adapt._
import repro.core.model.Calibration
import repro.sim.SourceNodeSim

/** State-machine and end-to-end control-loop tests for the Jarvis runtime
  * (paper Fig. 6) over the data-source simulator.
  */
class JarvisRuntimeSpec extends AnyFunSuite {

  private def s2sSim(budget: Double, noise: Double = 0.0) =
    new SourceNodeSim(Calibration.s2sProbe, budget, Calibration.PingmeshRecsPerSec,
      profileNoiseMag = noise)

  // ------------------------------------------------------------------
  // Phase transitions
  // ------------------------------------------------------------------

  test("startup runs with zero load factors") {
    val rt = new JarvisRuntime(s2sSim(0.5))
    val entry = rt.step()
    assert(entry.phase == Phase.Startup)
    assert(entry.p.forall(_ == 0.0))
  }

  test("probe triggers profiling only after 3 consecutive non-stable epochs") {
    val rt = new JarvisRuntime(s2sSim(0.5))
    rt.step() // startup
    rt.step(); rt.step()
    assert(rt.currentPhase == Phase.Probe)
    rt.step() // third non-stable probe epoch
    assert(rt.currentPhase == Phase.Profile)
  }

  test("profile consumes one epoch and seeds the LP plan") {
    val rt = new JarvisRuntime(s2sSim(1.0))
    rt.run(4) // startup + 3 probes (idle at p=0)
    val entry = rt.step()
    assert(entry.phase == Phase.Profile)
    // Ample budget: the LP runs the whole pipeline locally.
    assert(rt.loadFactors.forall(_ > 0.9), s"p=${rt.loadFactors}")
  }

  test("w/o LP-init resets load factors to zero at adaptation start") {
    val rt = new JarvisRuntime(s2sSim(1.0), RuntimeConfig.NoLpInit)
    rt.run(4)
    val entry = rt.step()
    assert(entry.phase == Phase.Profile)
    assert(rt.loadFactors.forall(_ == 0.0))
  }

  test("a stable epoch resets the detection streak") {
    // Budget exactly matches a p = 1 plan: after converging the probe phase
    // stays stable and never re-triggers profiling.
    val rt = new JarvisRuntime(s2sSim(0.9))
    rt.run(20)
    val log = rt.log
    val profiles = log.count(_.phase == Phase.Profile)
    assert(profiles == 1, s"expected exactly one adaptation, got $profiles")
  }

  // ------------------------------------------------------------------
  // Convergence end-to-end
  // ------------------------------------------------------------------

  test("converges to a stable full-local plan at 100% budget") {
    val rt = new JarvisRuntime(s2sSim(1.0))
    rt.run(12)
    assert(rt.convergences.nonEmpty, "never converged")
    assert(rt.loadFactors.forall(_ > 0.95), s"p=${rt.loadFactors}")
  }

  test("converges to a partial plan at 60% budget within the paper's bound") {
    val rt = new JarvisRuntime(s2sSim(0.6))
    rt.run(20)
    assert(rt.convergences.nonEmpty, "never converged")
    // Paper §IV-E: up to seven seconds (epochs) to stabilize.
    assert(rt.convergences.head <= 7, s"took ${rt.convergences.head} adapt epochs")
    // The converged plan respects the budget.
    val sim = s2sSim(0.6)
    val obs = sim.runEpoch(rt.loadFactors)
    assert(obs.cpuDemand <= obs.cpuBudget * 1.02, s"demand=${obs.cpuDemand}")
  }

  test("converged plan at 60% budget is the LP's full-pipeline fraction") {
    val rt = new JarvisRuntime(s2sSim(0.6))
    rt.run(20)
    // LP optimum: whole pipeline on ~70% of records (see LoadFactorLPSpec).
    assert(rt.loadFactors(0) > 0.6 && rt.loadFactors(0) < 0.8, s"p=${rt.loadFactors}")
    assert(rt.loadFactors(1) > 0.95, s"p=${rt.loadFactors}")
  }

  test("budget increase re-triggers adaptation and re-converges") {
    val sim = s2sSim(0.10)
    val rt = new JarvisRuntime(sim)
    rt.run(12)
    val firstConv = rt.convergences.size
    sim.budgetCores = 0.90
    rt.run(14)
    assert(rt.convergences.size > firstConv, "no re-adaptation after budget change")
    assert(rt.loadFactors.forall(_ > 0.9), s"p=${rt.loadFactors}")
  }

  test("budget drop re-triggers adaptation and the new plan fits") {
    val sim = s2sSim(0.90)
    val rt = new JarvisRuntime(sim)
    rt.run(12)
    sim.budgetCores = 0.60
    rt.run(16)
    val obs = sim.runEpoch(rt.loadFactors)
    assert(obs.cpuDemand <= obs.cpuBudget * 1.02,
      s"plan over-subscribes after drop: ${obs.cpuDemand} vs ${obs.cpuBudget}")
    // The plan is interior: some, but not all, of the stream stays local.
    assert(rt.loadFactors.exists(_ < 1.0 - 1e-9), s"p=${rt.loadFactors}")
    assert(obs.cpuDemand > obs.cpuBudget * 0.8, s"budget underused: ${obs.cpuDemand}")
  }

  test("LP-only with noisy profiling fails to stabilize after a budget drop") {
    val sim = new SourceNodeSim(Calibration.s2sProbe, 0.90, Calibration.PingmeshRecsPerSec,
      profileNoiseMag = 0.35)
    val rt = new JarvisRuntime(sim, RuntimeConfig.LpOnly)
    rt.run(12)
    sim.budgetCores = 0.60
    rt.run(20)
    // The second adaptation must not have completed (paper §VI-C).
    assert(rt.convergences.size <= 1,
      s"LP-only unexpectedly stabilized: ${rt.convergences}")
  }

  test("Jarvis with noisy profiling still stabilizes after a budget drop") {
    val sim = new SourceNodeSim(Calibration.s2sProbe, 0.90, Calibration.PingmeshRecsPerSec,
      profileNoiseMag = 0.35)
    val rt = new JarvisRuntime(sim)
    rt.run(12)
    sim.budgetCores = 0.60
    rt.run(20)
    assert(rt.convergences.size == 2, s"convergences=${rt.convergences}")
  }

  // ------------------------------------------------------------------
  // Classification thresholds (anti-oscillation, §IV-C)
  // ------------------------------------------------------------------

  test("mild under-utilization within IdleThres is stable") {
    val obs = EpochObs(Vector(ProxyObs(100, 50, 50)), cpuDemand = 0.95, cpuBudget = 1.0,
      drainedBytes = 0, outputBytes = 0)
    assert(PipelineState.classify(obs, Vector(0.5), 0.05, 0.10) == PipelineState.Stable)
  }

  test("under-utilization beyond IdleThres with p < 1 is idle") {
    val obs = EpochObs(Vector(ProxyObs(100, 50, 50)), cpuDemand = 0.5, cpuBudget = 1.0,
      drainedBytes = 0, outputBytes = 0)
    assert(PipelineState.classify(obs, Vector(0.5), 0.05, 0.10) == PipelineState.Idle)
  }

  test("under-utilization with all p = 1 is stable (nothing to raise)") {
    val obs = EpochObs(Vector(ProxyObs(100, 100, 100)), cpuDemand = 0.2, cpuBudget = 1.0,
      drainedBytes = 0, outputBytes = 0)
    assert(PipelineState.classify(obs, Vector(1.0), 0.05, 0.10) == PipelineState.Stable)
  }

  test("forced drains within DrainedThres are tolerated") {
    val obs = EpochObs(Vector(ProxyObs(100, 100, 97)), cpuDemand = 1.0, cpuBudget = 1.0,
      drainedBytes = 0, outputBytes = 0)
    assert(PipelineState.classify(obs, Vector(1.0), 0.05, 0.10) == PipelineState.Stable)
  }

  test("forced drains beyond DrainedThres are congested") {
    val obs = EpochObs(Vector(ProxyObs(100, 100, 80)), cpuDemand = 1.2, cpuBudget = 1.0,
      drainedBytes = 0, outputBytes = 0)
    assert(PipelineState.classify(obs, Vector(1.0), 0.05, 0.10) == PipelineState.Congested)
  }

  test("congestion on any proxy dominates idleness elsewhere") {
    val obs = EpochObs(Vector(ProxyObs(100, 10, 10), ProxyObs(10, 10, 5)),
      cpuDemand = 0.3, cpuBudget = 1.0, drainedBytes = 0, outputBytes = 0)
    assert(PipelineState.classify(obs, Vector(0.1, 1.0), 0.05, 0.10) == PipelineState.Congested)
  }

  // ------------------------------------------------------------------
  // Overhead (paper §VI-B: runtime consumes <1% of a core)
  // ------------------------------------------------------------------

  test("a control-loop step is computationally trivial") {
    val rt = new JarvisRuntime(s2sSim(0.6))
    val t0 = System.nanoTime()
    rt.run(30)
    val perEpochMs = (System.nanoTime() - t0) / 1e6 / 30
    // Generous bound: even with the simulator in the loop, far below 1% of
    // a 1-second epoch.
    assert(perEpochMs < 10.0, s"step took $perEpochMs ms")
  }
}
