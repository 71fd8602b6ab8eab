package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Exp6MultiQuery
import repro.sim.MultiQuerySim

/** T6 — paper Fig. 11: aggregate throughput of multiple query instances on
  * one data source for 1- and 2-core nodes at ×1/×5/×10 input scales.
  */
class T6MultiQueryBench extends AnyFunSuite {

  private def peak(cores: Int, demand: Double, mbps: Double, upTo: Int = 30): Int = {
    val agg = (1 to upTo).map(n =>
      MultiQuerySim.aggregateThroughput(cores, n, demand, mbps).aggThroughputMbps)
    agg.indexOf(agg.max) + 1
  }

  test("print T6 tables (Fig. 11)") {
    Exp6MultiQuery.printAll()
    assert(Exp6MultiQuery.maxQueries.size == 6)
  }

  test("x10 single-core throughput saturates at two queries (paper)") {
    val p = peak(1, 0.55, 26.2)
    info(s"peak at $p queries (paper: 2)")
    assert(p == 2)
  }

  test("x10 two-core throughput stops improving past ~3 queries (paper)") {
    val p = peak(2, 0.55, 26.2)
    info(s"peak at $p queries (paper: 3)")
    assert(p >= 3 && p <= 5)
  }

  test("x5: one core supports ~4 queries, two cores ~6 (paper)") {
    val p1 = peak(1, 0.30, 13.1)
    val p2 = peak(2, 0.30, 13.1)
    info(s"peaks: 1-core $p1 (paper 4), 2-core $p2 (paper 6)")
    assert(p1 >= 3 && p1 <= 5, s"p1=$p1")
    assert(p2 >= 5 && p2 <= 8, s"p2=$p2")
  }

  test("x1: one core supports ~15 queries, two cores 25+ (paper: 15 and 25)") {
    val n1 = MultiQuerySim.maxSupportedQueries(1, 0.05, 2.62)
    val n2 = MultiQuerySim.maxSupportedQueries(2, 0.05, 2.62)
    info(s"supported: 1-core $n1 (paper 15), 2-core $n2 (paper 25)")
    assert(n1 >= 13 && n1 <= 17, s"n1=$n1")
    assert(n2 >= 25, s"n2=$n2")
  }

  test("no significant interference below saturation (paper: none observed)") {
    for (n <- 1 to 3) {
      val r = MultiQuerySim.aggregateThroughput(2, n, 0.30, 13.1)
      assert(math.abs(r.aggThroughputMbps - n * 13.1) < 1e-6, s"n=$n: $r")
    }
  }

  test("two cores always at least match one core") {
    for (n <- 1 to 10) {
      val one = MultiQuerySim.aggregateThroughput(1, n, 0.30, 13.1).aggThroughputMbps
      val two = MultiQuerySim.aggregateThroughput(2, n, 0.30, 13.1).aggThroughputMbps
      assert(two >= one - 1e-9, s"n=$n")
    }
  }
}
