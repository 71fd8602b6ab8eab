package repro.sim

import org.scalatest.funsuite.AnyFunSuite

/** Tests for the multi-query fair-sharing model (paper §VI-F). */
class MultiQuerySimSpec extends AnyFunSuite {

  test("a single query within budget runs at full rate") {
    val r = MultiQuerySim.aggregateThroughput(1, 1, 0.55, 26.2)
    assert(math.abs(r.aggThroughputMbps - 26.2) < 1e-9)
    assert(!r.saturated)
  }

  test("throughput is linear while the node has headroom") {
    val r3 = MultiQuerySim.aggregateThroughput(2, 3, 0.30, 13.1)
    assert(math.abs(r3.aggThroughputMbps - 3 * 13.1) < 1e-9)
  }

  test("over-subscription degrades every query fairly and super-linearly") {
    val r = MultiQuerySim.aggregateThroughput(1, 3, 0.55, 26.2)
    assert(r.saturated)
    assert(r.aggThroughputMbps < 3 * 26.2)
    val demand = 3 * (0.55 + MultiQuerySim.PerQueryOverheadCores)
    val expected = 3 * 26.2 * math.pow(1.0 / demand, 1.5)
    assert(math.abs(r.aggThroughputMbps - expected) < 1e-6)
  }

  test("two cores support more queries than one") {
    val one = MultiQuerySim.maxSupportedQueries(1, 0.30, 13.1)
    val two = MultiQuerySim.maxSupportedQueries(2, 0.30, 13.1)
    assert(two > one, s"one=$one two=$two")
  }

  test("x1 scaling on one core supports ~15 queries (paper: 15)") {
    val n = MultiQuerySim.maxSupportedQueries(1, 0.05, 2.62)
    assert(n >= 13 && n <= 17, s"n=$n")
  }

  test("x10 scaling on one core peaks at two queries (paper: saturates at 2)") {
    val agg = (1 to 5).map(n => MultiQuerySim.aggregateThroughput(1, n, 0.55, 26.2).aggThroughputMbps)
    val peak = agg.indexOf(agg.max) + 1
    assert(peak == 2, s"agg=$agg")
  }

  test("x10 scaling on two cores stops improving past ~3 queries (paper)") {
    val agg = (1 to 6).map(n => MultiQuerySim.aggregateThroughput(2, n, 0.55, 26.2).aggThroughputMbps)
    val peak = agg.indexOf(agg.max) + 1
    assert(peak >= 3 && peak <= 5, s"agg=$agg")
  }

  test("aggregate throughput never increases when demand is added past saturation") {
    val agg = (1 to 12).map(n => MultiQuerySim.aggregateThroughput(1, n, 0.55, 26.2).aggThroughputMbps)
    val peak = agg.indexOf(agg.max)
    agg.drop(peak).sliding(2).foreach {
      case Seq(a, b) => assert(b <= a + 1e-9)
      case _         =>
    }
  }
}
