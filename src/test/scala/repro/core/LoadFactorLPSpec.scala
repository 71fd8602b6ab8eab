package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropHelpers
import repro.core.lp.LoadFactorLP
import repro.core.model.Calibration

/** Unit + property tests for the exact LP solver (paper Eq. 3). */
class LoadFactorLPSpec extends AnyFunSuite {

  private val Tol = 1e-9

  private def solve(c: Vector[Double], rho: Vector[Double], sigma: Vector[Double], beta: Double) =
    LoadFactorLP.solve(c, rho, sigma, beta)

  // ------------------------------------------------------------------
  // Degenerate and boundary cases
  // ------------------------------------------------------------------

  test("zero budget yields all-zero effective load factors") {
    val s = solve(Vector(1.0, 1.0), Vector(0.9, 1.0), Vector(100, 100), 0.0)
    assert(s.e.forall(_ == 0.0))
    assert(s.cpuSecPerRec == 0.0)
  }

  test("ample budget runs the whole pipeline locally") {
    val s = solve(Vector(1.0, 2.0), Vector(0.9, 1.0), Vector(100, 100), 100.0)
    assert(s.e.forall(x => math.abs(x - 1.0) < Tol))
  }

  test("free operators (zero cost) always run fully") {
    val s = solve(Vector(0.0), Vector(0.5), Vector(100), 0.0)
    assert(s.e.head == 1.0)
  }

  test("single operator with half the budget processes half the stream") {
    val s = solve(Vector(2.0), Vector(0.5), Vector(100), 1.0)
    assert(math.abs(s.e.head - 0.5) < Tol)
  }

  test("single operator budget never exceeded") {
    for (beta <- Seq(0.1, 0.5, 0.9, 1.5, 3.0)) {
      val s = solve(Vector(2.0), Vector(0.5), Vector(100), beta)
      assert(s.cpuSecPerRec <= beta + Tol)
    }
  }

  test("relay-zero upstream makes downstream free") {
    // Op 1 filters everything out; op 2 costs nothing to 'run on nothing'.
    val s = solve(Vector(1.0, 5.0), Vector(0.0, 1.0), Vector(100, 100), 1.0)
    assert(s.e.head == 1.0)
    assert(s.cpuSecPerRec <= 1.0 + Tol)
  }

  test("e is monotone non-increasing") {
    val s = solve(Vector(0.5, 1.0, 2.0), Vector(0.9, 0.8, 1.0), Vector(100, 90, 80), 0.7)
    s.e.zip(s.e.drop(1)).foreach { case (a, b) => assert(a >= b - Tol) }
  }

  test("p recovers e via cumulative product") {
    val s = solve(Vector(0.5, 1.0, 2.0), Vector(0.9, 0.8, 1.0), Vector(100, 90, 80), 0.7)
    val eBack = LoadFactorLP.pToE(s.p)
    s.e.zip(eBack).foreach { case (a, b) => assert(math.abs(a - b) < 1e-6) }
  }

  test("pToE and eToP round-trip on interior vectors") {
    val e = Vector(0.9, 0.63, 0.63, 0.2)
    val p = LoadFactorLP.eToP(e)
    val e2 = LoadFactorLP.pToE(p)
    e.zip(e2).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
  }

  test("eToP emits 1.0 below a dead prefix") {
    val p = LoadFactorLP.eToP(Vector(0.0, 0.0))
    assert(p == Vector(0.0, 1.0))
  }

  test("ragged inputs are rejected") {
    intercept[IllegalArgumentException] {
      solve(Vector(1.0), Vector(0.5, 0.5), Vector(100), 1.0)
    }
  }

  test("negative cost rejected") {
    intercept[IllegalArgumentException] {
      solve(Vector(-1.0), Vector(0.5), Vector(100), 1.0)
    }
  }

  test("relay above one rejected") {
    intercept[IllegalArgumentException] {
      solve(Vector(1.0), Vector(1.5), Vector(100), 1.0)
    }
  }

  // ------------------------------------------------------------------
  // Optimality against brute force
  // ------------------------------------------------------------------

  /** Grid-enumerated minimum drained bytes over monotone e vectors. */
  private def bruteForce(c: Vector[Double], rho: Vector[Double], sigma: Vector[Double],
                         beta: Double, steps: Int = 40): Double = {
    val m = c.length
    var best = LoadFactorLP.drainedBytes(Vector.fill(m)(0.0), rho, sigma)
    def rec(i: Int, prev: Double, e: List[Double]): Unit =
      if (i == m) {
        val ev = e.reverse.toVector
        if (LoadFactorLP.cpuSec(ev, rho, c) <= beta + 1e-12) {
          val d = LoadFactorLP.drainedBytes(ev, rho, sigma)
          if (d < best) best = d
        }
      } else {
        var k = 0
        while (k <= steps) {
          val v = k.toDouble / steps
          if (v <= prev + 1e-12) rec(i + 1, v, v :: e)
          k += 1
        }
      }
    rec(0, 1.0, Nil)
    best
  }

  test("LP optimum matches brute force on a hand-picked 2-op instance") {
    val (c, rho, sigma) = (Vector(0.2, 1.5), Vector(0.86, 1.0), Vector(86.0, 86.0))
    for (beta <- Seq(0.1, 0.4, 0.8, 1.2, 1.6)) {
      val lp = solve(c, rho, sigma, beta)
      val bf = bruteForce(c, rho, sigma, beta)
      assert(lp.drainedBytesPerRec <= bf + 1e-6,
        s"beta=$beta lp=${lp.drainedBytesPerRec} bf=$bf")
      assert(lp.cpuSecPerRec <= beta + 1e-9)
    }
  }

  test("LP optimum matches brute force on a hand-picked 3-op instance") {
    val (c, rho, sigma) = (Vector(0.1, 0.9, 0.4), Vector(0.86, 1.0, 1.0), Vector(86.0, 86.0, 20.0))
    for (beta <- Seq(0.05, 0.3, 0.7, 1.1, 1.5)) {
      val lp = solve(c, rho, sigma, beta)
      val bf = bruteForce(c, rho, sigma, beta, steps = 25)
      assert(lp.drainedBytesPerRec <= bf + 1e-6,
        s"beta=$beta lp=${lp.drainedBytesPerRec} bf=$bf")
    }
  }

  private val instanceGen = for {
    m <- Gen.choose(1, 3)
    c <- Gen.listOfN(m, Gen.choose(0.0, 2.0))
    rho <- Gen.listOfN(m, Gen.choose(0.0, 1.0))
    sigma <- Gen.listOfN(m, Gen.choose(1.0, 200.0))
    beta <- Gen.choose(0.0, 2.5)
  } yield (c.toVector, rho.toVector, sigma.toVector, beta)

  test("property: LP is feasible and at least as good as grid search") {
    for ((c, rho, sigma, beta) <- PropHelpers.samples(instanceGen, 60)) {
      val lp = solve(c, rho, sigma, beta)
      assert(lp.cpuSecPerRec <= beta + 1e-9)
      lp.e.zip(lp.e.drop(1)).foreach { case (a, b) => assert(a >= b - 1e-9) }
      val bf = bruteForce(c, rho, sigma, beta, steps = 20)
      assert(lp.drainedBytesPerRec <= bf + 1e-6,
        s"c=$c rho=$rho sigma=$sigma beta=$beta lp=${lp.drainedBytesPerRec} bf=$bf")
    }
  }

  test("property: drained bytes decrease (weakly) with budget") {
    for ((c, rho, sigma, beta) <- PropHelpers.samples(instanceGen, 40, seed = 555L)) {
      val lo = solve(c, rho, sigma, beta)
      val hi = solve(c, rho, sigma, beta * 1.5 + 0.1)
      assert(hi.drainedBytesPerRec <= lo.drainedBytesPerRec + 1e-9)
    }
  }

  // ------------------------------------------------------------------
  // Calibrated workload sanity
  // ------------------------------------------------------------------

  test("S2SProbe at 60% budget: full-pipeline fraction beats filter-everything") {
    // The LP's optimum is the whole pipeline on ~70.6% of records (drains
    // 25.3 B/rec), slightly better than F-on-everything + G+R on 65%
    // (25.9 B/rec): the filter only saves 14% of bytes, so budget is better
    // spent pushing records through the full chain.
    val q = Calibration.s2sProbe
    val rate = q.inputRecsPerSec
    val rho = Vector(Calibration.S2SFilterKeep, 1.0)
    val s = solve(q.ops.map(_.costSecPerRec), rho, q.bytesAtOp, 0.6 / rate)
    assert(math.abs(s.e(0) - 0.6 / 0.85) < 1e-6, s"e=${s.e}")
    assert(math.abs(s.e(1) - 0.6 / 0.85) < 1e-6, s"e=${s.e}")
    val filterFirst = LoadFactorLP.drainedBytes(Vector(1.0, (0.6 - 0.13) / 0.72), rho, q.bytesAtOp)
    assert(s.drainedBytesPerRec <= filterFirst + 1e-9)
  }

  test("S2SProbe at 100% budget runs everything locally") {
    val q = Calibration.s2sProbe
    val rho = Vector(Calibration.S2SFilterKeep, 1.0)
    val s = solve(q.ops.map(_.costSecPerRec), rho, q.bytesAtOp, 1.0 / q.inputRecsPerSec)
    assert(s.e.forall(_ > 0.99))
  }

  test("T2TProbe at 60% budget prefers processing past the join (projection shrinks data)") {
    val q = Calibration.t2tProbe()
    val rho = Vector(Calibration.S2SFilterKeep, 1.0, 1.0)
    val s = solve(q.ops.map(_.costSecPerRec), rho, q.bytesAtOp, 0.6 / q.inputRecsPerSec)
    assert(s.e(0) > 0.99, s"cheap F should run fully: ${s.e}")
    assert(s.e(1) > 0.1, s"J should process a meaningful fraction: ${s.e}")
    assert(s.cpuSecPerRec <= 0.6 / q.inputRecsPerSec + 1e-12)
  }
}
