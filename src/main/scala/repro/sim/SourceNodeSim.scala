package repro.sim

import repro.core.adapt._
import repro.core.model.{Calibration, QuerySpec}

/** Deterministic pseudo-random stream (no java.util.Random so runs are
  * reproducible from the seed alone).
  */
final class Lcg(seed: Long) {
  private var state: Long = seed * 6364136223846793005L + 1442695040888963407L
  /** Next double in [0, 1). */
  def next(): Double = {
    state = state * 6364136223846793005L + 1442695040888963407L
    ((state >>> 11).toDouble / (1L << 53).toDouble)
  }
}

/** Fluid epoch-level simulation of one query instance on one data source
  * node — the substrate substituting for the paper's MiNiFi agent on a
  * t2.micro (DESIGN.md §2).
  *
  * Per epoch: records arrive at the configured rate, each control proxy
  * forwards `p_i` of its incoming records to the local operator and drains
  * the rest; when the summed demand exceeds the CPU budget, effective
  * processing degrades super-linearly ((C/D)^(1+α), Calibration.OverloadAlpha)
  * and unprocessed records are force-drained so the epoch's latency bound
  * holds. Conditions (budget, rate, operator costs) are mutable so scenarios
  * can change them mid-run.
  *
  * Profiling (paper §IV-C "Profile") runs each operator in a budget slice
  * of the epoch; when the slice processes only a fraction of the operator's
  * available input the cost estimate is biased low (an operator that cannot
  * drain its queue looks cheaper than it is), reproducing the estimation
  * errors of §VI-C.
  */
final class SourceNodeSim(
    initialSpec: QuerySpec,
    var budgetCores: Double,
    var inputRecsPerSec: Double,
    profileNoiseMag: Double = 0.35,
    seed: Long = 42L,
) extends EpochExecutor {

  private var querySpec: QuerySpec = initialSpec
  private val rng = new Lcg(seed)

  def spec: QuerySpec = querySpec
  /** Swap the query spec mid-run (e.g. a join-table size change). */
  def setSpec(q: QuerySpec): Unit = {
    require(q.numOps == initialSpec.numOps, "cannot change operator count mid-run")
    querySpec = q
  }

  def numOps: Int = querySpec.numOps

  def observedByteRelays: Vector[Double] = querySpec.byteRelays(math.max(inputRecsPerSec, 1.0))

  def runEpoch(p: Vector[Double]): EpochObs = {
    require(p.length == numOps, "load factor arity mismatch")
    val epoch = Calibration.EpochSeconds
    val n = inputRecsPerSec * epoch
    val ops = querySpec.ops

    // Pass 1: intended flow (everything forwarded gets processed).
    val intendedIn = new Array[Double](numOps)
    val intendedFwd = new Array[Double](numOps)
    var in = n
    var i = 0
    while (i < numOps) {
      intendedIn(i) = in
      intendedFwd(i) = p(i) * in
      in = ops(i).outRecsPerSec(intendedFwd(i))
      i += 1
    }
    val demand = (0 until numOps).map(i => intendedFwd(i) * ops(i).costSecPerRec).sum
    val budget = budgetCores * epoch
    val scale =
      if (demand <= budget || demand <= 0) 1.0
      else math.pow(budget / demand, 1.0 + Calibration.OverloadAlpha)

    // Pass 2: effective flow under the processing scale; shortfall at each
    // proxy is force-drained (compounding downstream, as backpressure does).
    val incoming = new Array[Double](numOps)
    val intended = new Array[Double](numOps)
    val processed = new Array[Double](numOps)
    var drainedBytes = 0.0
    in = n
    i = 0
    while (i < numOps) {
      incoming(i) = in
      intended(i) = p(i) * in
      processed(i) = intended(i) * scale
      val plannedDrain = in - intended(i)
      val forcedDrain = intended(i) - processed(i)
      drainedBytes += (plannedDrain + forcedDrain) * ops(i).bytesInPerRec
      in = ops(i).outRecsPerSec(processed(i))
      i += 1
    }
    val outputBytes = in * ops.last.bytesOutPerRec

    EpochObs(
      proxies = Vector.tabulate(numOps)(i => ProxyObs(incoming(i), intended(i), processed(i))),
      cpuDemand = demand,
      cpuBudget = budget,
      drainedBytes = drainedBytes,
      outputBytes = outputBytes,
    )
  }

  def runProfileEpoch(): ProfileEstimates = {
    val ops = querySpec.ops
    val n = inputRecsPerSec * Calibration.EpochSeconds
    val slice = budgetCores * Calibration.EpochSeconds / numOps
    val avail = querySpec.recProducts(math.max(inputRecsPerSec, 1.0)).take(numOps).map(_ * n)
    val costs = Vector.tabulate(numOps) { i =>
      val c = ops(i).costSecPerRec
      val processable = if (c <= 0) Double.MaxValue else slice / c
      val accuracy = math.min(1.0, processable / math.max(avail(i), 1.0))
      // Under-sampled operators look cheaper than they are; a seeded jitter
      // keeps repeated profiles from being identical.
      val bias = profileNoiseMag * (1.0 - accuracy) * (0.7 + 0.3 * rng.next())
      c * (1.0 - bias)
    }
    val rho = {
      val prods = querySpec.recProducts(math.max(inputRecsPerSec, 1.0))
      Vector.tabulate(numOps)(i => if (prods(i) <= 0) 0.0 else prods(i + 1) / prods(i))
    }
    ProfileEstimates(
      costs = costs,
      recRelays = rho,
      bytesAtOp = querySpec.bytesAtOp,
      budgetPerRec = budgetCores / math.max(inputRecsPerSec, 1.0),
    )
  }
}
