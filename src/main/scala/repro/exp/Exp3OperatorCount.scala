package repro.exp

import repro.sim.ConvergenceStudy

/** T3 (paper §VI-C "Impact of number of operators"): exhaustive convergence
  * study of the model-agnostic variant over synthetic configurations with
  * 2–4 operators. The paper reports up to 21 epochs in the worst case with
  * four operators, motivating the LP initialization.
  */
object Exp3OperatorCount {

  def run(): Vector[ConvergenceStudy.StudyResult] = (2 to 4).toVector.map(ConvergenceStudy.run(_))

  def printAll(): Unit = {
    val rows = run()
    Tab.print(
      "T3: w/o LP-init convergence vs operator count (exhaustive configs)",
      Seq("ops", "configs", "max epochs", "avg epochs", "p95 epochs", "not converged"),
      rows.map(r => Seq(r.numOps.toString, r.configs.toString, r.maxEpochs.toString,
        Tab.f1(r.avgEpochs), r.p95Epochs.toString, r.notConverged.toString)),
    )
  }
}
