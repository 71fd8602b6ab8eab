package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Exp3OperatorCount

/** T3 — paper §VI-C "Impact of number of operators": worst-case convergence
  * of the model-agnostic variant grows with the operator count (paper: up
  * to 21 epochs at four operators), motivating LP initialization.
  */
class T3OperatorCountBench extends AnyFunSuite {

  private lazy val results = Exp3OperatorCount.run()

  test("print T3 table") {
    Exp3OperatorCount.printAll()
    assert(results.map(_.numOps) == Vector(2, 3, 4))
  }

  test("worst case grows monotonically with operator count") {
    val worst = results.map(_.maxEpochs)
    info(s"max epochs by op count: $worst (paper: up to 21 at 4 ops)")
    worst.zip(worst.drop(1)).foreach { case (a, b) => assert(b >= a, s"$worst") }
  }

  test("four-operator worst case is in the paper's regime (~21 epochs)") {
    val m4 = results.last
    assert(m4.maxEpochs >= 12 && m4.maxEpochs <= 40, s"max=${m4.maxEpochs}")
  }

  test("average convergence also grows with operator count") {
    val avg = results.map(_.avgEpochs)
    assert(avg.head < avg.last, s"$avg")
  }

  test("almost all configurations converge under the cap") {
    results.foreach(r => assert(r.notConverged <= r.configs / 10,
      s"ops=${r.numOps}: ${r.notConverged}/${r.configs} unconverged"))
  }
}
