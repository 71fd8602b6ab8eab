package repro.exp

import org.scalatest.funsuite.AnyFunSuite

/** Smoke tests for the simulator-backed experiment harnesses (the heavy,
  * asserted runs live in the bench project; these keep the harness wiring
  * honest in unit-test time).
  */
class ExpSmokeSpec extends AnyFunSuite {

  test("T1 tables render one row per budget and one column per strategy") {
    for (s <- Exp1Throughput.setups) {
      val (headers, rows) = Exp1Throughput.table(s)
      assert(headers.length == 7)
      assert(rows.length == Exp1Throughput.Budgets.length)
    }
  }

  test("T1 fig3 companion: data-level traffic is below operator-level") {
    val rows = Exp1Throughput.fig3()
    assert(rows.length == 2)
    val op = rows.find(_.scheme.contains("operator")).get
    val dl = rows.find(_.scheme.contains("data-level")).get
    assert(dl.netMbps < op.netMbps, s"$rows")
    assert(dl.grProcessedPct > op.grProcessedPct)
  }

  test("T2 produces a row per (scenario, change, variant)") {
    val rows = Exp2Convergence.scenarios.flatMap(Exp2Convergence.run)
    assert(rows.length == 3 * 2 * 3)
  }

  test("T2: Jarvis converges on every change") {
    val rows = Exp2Convergence.scenarios.flatMap(Exp2Convergence.run)
    val jarvis = rows.filter(_.variant == "Jarvis")
    assert(jarvis.forall(_.adaptEpochs.nonEmpty), s"$jarvis")
  }

  test("T3 produces results for 2..4 operators") {
    assert(Exp3OperatorCount.run().map(_.numOps) == Vector(2, 3, 4))
  }

  test("T4 Jarvis network rows cover both budgets") {
    val rows = Exp4Synopsis.jarvisRows
    assert(rows.map(_.budgetPct) == Vector(20, 100))
    assert(rows.forall(r => r.netPctOfInput > 0 && r.netPctOfInput <= 100))
  }

  test("T5 produces scaling rows and a summary") {
    val rows = Exp5Scaling.run(Exp5Scaling.settings.head)
    assert(rows.nonEmpty)
    assert(Exp5Scaling.maxSources.length == 6)
  }

  test("T6 produces rows for both core counts") {
    val rows = Exp6MultiQuery.run(Exp6MultiQuery.settings.head)
    assert(rows.map(_.cores).distinct.sorted == Vector(1, 2))
  }

  test("table formatting aligns columns") {
    val s = Tab.format("t", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    assert(s.contains("== t =="))
    assert(s.linesIterator.drop(1).map(_.length).toSet.size == 1)
  }
}
