package repro.core.model

/** Kind of a stream operator in a monitoring query DAG (paper §II-A).
  *
  * The Window assigner carries no per-record compute cost and is folded into
  * ingestion; the partitionable operators are the costed ones below.
  */
sealed trait OpKind
object OpKind {
  /** Per-record predicate; drops uninteresting records. */
  case object Filter extends OpKind
  /** User-defined transformation (parse / split / project). */
  case object Map extends OpKind
  /** Stream joined with a static table (hash lookups). */
  case object Join extends OpKind
  /** Grouping + incremental reduction (hash aggregation). */
  case object GroupReduce extends OpKind
}

/** One stream operator with its steady-state cost/relay characteristics.
  *
  * @param name          display name ("F", "J", "G+R", ...)
  * @param kind          operator kind
  * @param costSecPerRec CPU-seconds to process one input record
  * @param recRelay      output records per input record (flow-through ops);
  *                      for [[OpKind.GroupReduce]] the output is bounded by
  *                      `groupCount` per window instead
  * @param bytesInPerRec serialized wire size of one input record — the cost
  *                      of draining a record at this operator's proxy
  * @param bytesOutPerRec serialized wire size of one output record
  * @param groupCount    for GroupReduce: number of distinct groups per window
  * @param windowEpochs  for GroupReduce: epochs per emission window
  */
final case class OperatorSpec(
    name: String,
    kind: OpKind,
    costSecPerRec: Double,
    recRelay: Double,
    bytesInPerRec: Double,
    bytesOutPerRec: Double,
    groupCount: Long = 0L,
    windowEpochs: Int = 1,
) {
  require(costSecPerRec >= 0, s"negative cost for $name")
  require(recRelay >= 0 && recRelay <= 1, s"record relay out of [0,1] for $name")

  /** Output records per second given input records per second.
    *
    * GroupReduce emits one record per *occupied* group per window, amortized
    * over the window's epochs; occupancy follows the balls-in-bins
    * expectation g·(1 − e^(−n/g)) for n window records over g groups, so at
    * low rates (few probes per pair per window) the aggregation deduplicates
    * little and at high rates it saturates at the group count. Flow-through
    * operators are proportional.
    */
  def outRecsPerSec(inRecsPerSec: Double): Double = kind match {
    case OpKind.GroupReduce =>
      if (inRecsPerSec <= 0 || groupCount <= 0) 0.0
      else {
        val windowRecs = inRecsPerSec * windowEpochs
        val occupied = groupCount.toDouble * (1.0 - math.exp(-windowRecs / groupCount.toDouble))
        math.min(inRecsPerSec, occupied / windowEpochs)
      }
    case _ => inRecsPerSec * recRelay
  }

  /** Effective byte relay ratio (output bytes / input bytes) at a rate. */
  def byteRelayAt(inRecsPerSec: Double): Double =
    if (inRecsPerSec <= 0) 0.0
    else outRecsPerSec(inRecsPerSec) * bytesOutPerRec / (inRecsPerSec * bytesInPerRec)
}

/** A monitoring query: a chain of operators over a record stream.
  *
  * @param name           query name (S2SProbe / T2TProbe / LogAnalytics)
  * @param ops            operators in topological (pipeline) order
  * @param inputRecBytes  wire size of one raw input record
  * @param inputRecsPerSec calibrated full input record rate (at scale x10)
  */
final case class QuerySpec(
    name: String,
    ops: Vector[OperatorSpec],
    inputRecBytes: Double,
    inputRecsPerSec: Double,
) {
  require(ops.nonEmpty, "query needs at least one operator")
  require(
    math.abs(ops.head.bytesInPerRec - inputRecBytes) < 1e-9,
    "first operator must consume raw input records",
  )

  def numOps: Int = ops.length

  /** Input record rate into operator i (0-based) when every upstream load
    * factor is 1, for a given source input rate.
    */
  def recsIntoOp(i: Int, inputRate: Double): Double =
    ops.take(i).foldLeft(inputRate)((r, op) => op.outRecsPerSec(r))

  /** CPU demand in cores to run operator i on its full input at `inputRate`. */
  def opDemandCores(i: Int, inputRate: Double): Double =
    recsIntoOp(i, inputRate) * ops(i).costSecPerRec

  /** Total CPU demand in cores to run the whole query at `inputRate`. */
  def totalDemandCores(inputRate: Double): Double =
    ops.indices.map(opDemandCores(_, inputRate)).sum

  /** Record-relay products R_k = prod_{j<k} rho_j at a rate (length M+1,
    * R_0 = 1) — the fraction of input records reaching proxy k when all
    * load factors are 1.
    */
  def recProducts(inputRate: Double): Vector[Double] =
    ops.indices
      .scanLeft(inputRate)((r, i) => ops(i).outRecsPerSec(r))
      .map(r => if (inputRate <= 0) 0.0 else r / inputRate)
      .toVector

  /** Wire bytes per record at the input of each operator (length M). */
  def bytesAtOp: Vector[Double] = ops.map(_.bytesInPerRec)

  /** Input megabits per second at a given record rate. */
  def mbps(recsPerSec: Double): Double = recsPerSec * inputRecBytes * 8 / 1e6

  /** Record rate for a given input megabits per second. */
  def recsPerSecFor(mbps: Double): Double = mbps * 1e6 / 8 / inputRecBytes

  /** Byte relay ratios r_i (output bytes / input bytes) per operator at the
    * full input rate — the "relay ratio" of paper Table II.
    */
  def byteRelays(inputRate: Double): Vector[Double] =
    ops.indices.map(i => ops(i).byteRelayAt(recsIntoOp(i, inputRate))).toVector
}
