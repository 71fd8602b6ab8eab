package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Exp2Convergence

/** T2 — paper Fig. 8: convergence speed after resource changes, Jarvis vs
  * the model-based-only and model-agnostic-only ablations.
  */
class T2ConvergenceBench extends AnyFunSuite {

  private lazy val rows = Exp2Convergence.scenarios.flatMap(Exp2Convergence.run)

  private def conv(scenario: String, changeContains: String, variant: String): Option[Int] =
    rows.find(r => r.scenario == scenario && r.change.contains(changeContains) &&
      r.variant == variant).flatMap(_.adaptEpochs)

  test("print T2 table (Fig. 8)") {
    Exp2Convergence.printAll()
    assert(rows.size == 18)
  }

  test("Jarvis converges on every change within the paper's seven-epoch bound") {
    val jarvis = rows.filter(_.variant == "Jarvis")
    jarvis.foreach { r =>
      assert(r.adaptEpochs.nonEmpty, s"$r never converged")
      assert(r.adaptEpochs.get <= 7, s"$r exceeded 7 adapt epochs")
    }
  }

  test("S2S budget jump 10->90: LP init converges almost immediately (paper: 1 epoch)") {
    val j = conv("S2SProbe", "10%->90%", "Jarvis")
    info(s"Jarvis: $j adapt epochs (paper: 1)")
    assert(j.exists(_ <= 2), s"j=$j")
  }

  test("S2S: Jarvis is faster than w/o LP-init on the budget jump (paper: 1 vs 6)") {
    val j = conv("S2SProbe", "10%->90%", "Jarvis")
    val n = conv("S2SProbe", "10%->90%", "w/o LP-init")
    info(s"Jarvis=$j w/o LP-init=$n (paper: 1 vs 6)")
    assert(j.nonEmpty && n.nonEmpty)
    assert(j.get < n.get, s"jarvis=$j noLpInit=$n")
  }

  test("S2S budget drop 90->60: both adapt, Jarvis at most as slow (paper: 2 vs 4)") {
    val j = conv("S2SProbe", "90%->60%", "Jarvis")
    val n = conv("S2SProbe", "90%->60%", "w/o LP-init")
    info(s"Jarvis=$j w/o LP-init=$n (paper: 2 vs 4)")
    assert(j.nonEmpty && n.nonEmpty)
    assert(j.get <= n.get, s"jarvis=$j noLpInit=$n")
  }

  test("T2T: Jarvis beats w/o LP-init on the budget jump (paper: 7 vs 11)") {
    val j = conv("T2TProbe", "10%->100%", "Jarvis")
    val n = conv("T2TProbe", "10%->100%", "w/o LP-init")
    info(s"Jarvis=$j w/o LP-init=$n (paper: 7 vs 11)")
    assert(j.nonEmpty && n.nonEmpty)
    assert(j.get <= n.get, s"jarvis=$j noLpInit=$n")
  }

  test("T2T table-size jump: both re-stabilize (paper: 3 vs 5)") {
    val j = conv("T2TProbe", "table 50->500", "Jarvis")
    val n = conv("T2TProbe", "table 50->500", "w/o LP-init")
    info(s"Jarvis=$j w/o LP-init=$n (paper: 3 vs 5)")
    assert(j.nonEmpty && n.nonEmpty)
  }

  test("LP only fails to stabilize on at least one change per join/noisy scenario (paper §VI-C)") {
    val lpFailures = rows.count(r => r.variant == "LP only" && r.adaptEpochs.isEmpty)
    info(s"LP-only unconverged changes: $lpFailures of 6")
    assert(lpFailures >= 1, rows.filter(_.variant == "LP only").mkString("\n"))
  }

  test("LogAnalytics: Jarvis at most as slow as w/o LP-init on both changes") {
    for (ch <- Seq("5%->30%", "30%->15%")) {
      val j = conv("LogAnalytics", ch, "Jarvis")
      val n = conv("LogAnalytics", ch, "w/o LP-init")
      assert(j.nonEmpty, s"$ch jarvis missing")
      assert(n.forall(nv => j.get <= nv), s"$ch: jarvis=$j noLpInit=$n")
    }
  }
}
