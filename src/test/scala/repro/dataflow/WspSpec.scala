package repro.dataflow

import repro.SparkSpec

/** Behavior of the window-based sampling baseline (§VI-D): accuracy decays
  * with the sampling rate, and sparse anomalies get missed.
  */
class WspSpec extends SparkSpec {

  private lazy val pings = MonitoringData.pingmesh(spark, nSources = 12, nPeers = 40,
    nEpochs = 40, probesPerEpoch = 3, anomalyPairRate = 0.03).cache()

  private lazy val byRate = Map(
    0.2 -> Wsp.evaluate(pings, 0.2),
    0.6 -> Wsp.evaluate(pings, 0.6),
    1.0 -> Wsp.evaluate(pings, 1.0),
  )

  test("full sampling is exact") {
    val r = byRate(1.0)
    assert(r.errLe1msPct > 99.9, s"$r")
    assert(r.missedAlertPct == 0.0, s"$r")
  }

  test("the stream contains true alerts to miss") {
    assert(byRate(1.0).trueAlerts >= 10, s"${byRate(1.0)}")
  }

  test("accuracy decays as the sampling rate drops") {
    assert(byRate(0.2).errLe1msPct < byRate(0.6).errLe1msPct)
    assert(byRate(0.6).errLe1msPct <= byRate(1.0).errLe1msPct)
  }

  test("low sampling rates miss alerts (paper: 10-38% at 0.2-0.4)") {
    assert(byRate(0.2).missedAlertPct > 5.0, s"${byRate(0.2)}")
  }

  test("high sampling rates miss few alerts") {
    assert(byRate(0.6).missedAlertPct < byRate(0.2).missedAlertPct)
  }

  test("network transfer equals the sampling rate") {
    assert(byRate(0.2).netPctOfInput == 20.0)
    assert(byRate(0.6).netPctOfInput == 60.0)
  }

  test("pair-window population matches the exact aggregation") {
    assert(byRate(1.0).pairWindows == Wsp.trueStats(pings).count())
  }
}
