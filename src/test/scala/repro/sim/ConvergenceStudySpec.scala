package repro.sim

import org.scalatest.funsuite.AnyFunSuite

/** Tests for the exhaustive operator-count convergence study (§VI-C). */
class ConvergenceStudySpec extends AnyFunSuite {

  private lazy val results = (2 to 4).map(ConvergenceStudy.run(_))

  test("every configuration enumerates the expected grid") {
    results.foreach(r => assert(r.configs == 4 * 3 * 5, s"ops=${r.numOps}: ${r.configs}"))
  }

  test("the model-agnostic variant converges on (almost) all configurations") {
    results.foreach(r =>
      assert(r.notConverged <= r.configs / 10, s"ops=${r.numOps}: ${r.notConverged} unconverged"))
  }

  test("worst-case convergence grows with the operator count") {
    val worst = results.map(_.maxEpochs)
    assert(worst(0) < worst(2), s"max epochs per op count: $worst")
  }

  test("average convergence grows with the operator count") {
    val avg = results.map(_.avgEpochs)
    assert(avg(0) < avg(2), s"avg epochs per op count: $avg")
  }

  test("four operators can need on the order of the paper's 21 epochs") {
    val m4 = results(2)
    assert(m4.maxEpochs >= 10, s"max=${m4.maxEpochs}")
    assert(m4.maxEpochs <= 60, s"max=${m4.maxEpochs}")
  }

  test("p95 is at most the max") {
    results.foreach(r => assert(r.p95Epochs <= r.maxEpochs))
  }
}
