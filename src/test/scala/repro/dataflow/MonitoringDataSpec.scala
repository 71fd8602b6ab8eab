package repro.dataflow

import org.apache.spark.sql.functions._
import repro.{DfCompare, SparkSpec}

/** Tests for the synthetic monitoring stream generators. */
class MonitoringDataSpec extends SparkSpec {

  private lazy val pings = MonitoringData.pingmesh(spark, nSources = 6, nPeers = 30,
    nEpochs = 24, probesPerEpoch = 4).cache()
  private lazy val lines = MonitoringData.logLines(spark, nSources = 4, nTenants = 8,
    nEpochs = 24, linesPerEpoch = 6).cache()

  test("pingmesh has the Pingmesh record schema") {
    assert(pings.columns.toSet ==
      Set("recId", "ts", "srcIp", "dstIp", "srcCluster", "dstCluster", "rtt", "errCode"))
  }

  test("pingmesh row count matches sources x epochs x probes") {
    assert(pings.count() == 6L * 24 * 4)
  }

  test("pingmesh record ids are unique") {
    assert(pings.select("recId").distinct().count() == pings.count())
  }

  test("pingmesh srcIp stays within the source range") {
    val r = pings.agg(min("srcIp"), max("srcIp")).collect()(0)
    assert(r.getLong(0) >= 0 && r.getLong(1) < 6)
  }

  test("pingmesh dstIp stays within the peer range") {
    val r = pings.agg(min("dstIp"), max("dstIp")).collect()(0)
    assert(r.getLong(0) >= 0 && r.getLong(1) < 30)
  }

  test("pingmesh timestamps cover the requested epochs") {
    val r = pings.agg(min("ts"), max("ts")).collect()(0)
    assert(r.getLong(0) >= 0 && r.getLong(1) < 24L * 1000)
  }

  test("pingmesh error rate is near the configured 14%") {
    val errs = pings.filter(col("errCode") =!= 0).count().toDouble / pings.count()
    assert(errs > 0.10 && errs < 0.18, s"err rate $errs")
  }

  test("pingmesh error codes are in 0..3") {
    val r = pings.agg(min("errCode"), max("errCode")).collect()(0)
    assert(r.getInt(0) == 0 && r.getInt(1) <= 3)
  }

  test("pingmesh base RTT is sub-2ms; anomalies reach beyond 5ms") {
    val r = pings.agg(min("rtt"), max("rtt"), avg("rtt")).collect()(0)
    assert(r.getDouble(0) >= 0.2)
    assert(r.getDouble(1) > 5.0, s"max rtt ${r.getDouble(1)} — expected anomalies")
    assert(r.getDouble(2) < 2.5, s"avg rtt ${r.getDouble(2)} — anomalies should be sparse")
  }

  test("anomalous records are a small fraction (sparse anomalies)") {
    val frac = pings.filter(col("rtt") > 5.0).count().toDouble / pings.count()
    assert(frac > 0.0 && frac < 0.05, s"anomaly fraction $frac")
  }

  test("pingmesh generation is deterministic in the seed") {
    val again = MonitoringData.pingmesh(spark, 6, 30, 24, probesPerEpoch = 4)
    DfCompare.assertSameRows(pings, again, "pingmesh determinism")
  }

  test("different seeds yield different data") {
    val other = MonitoringData.pingmesh(spark, 6, 30, 24, probesPerEpoch = 4, seed = 99L)
    val a = pings.agg(sum("rtt")).collect()(0).getDouble(0)
    val b = other.agg(sum("rtt")).collect()(0).getDouble(0)
    assert(math.abs(a - b) > 1e-6)
  }

  test("torMap covers every ip exactly once") {
    val tor = MonitoringData.torMap(spark, 40, ipsPerTor = 10)
    assert(tor.count() == 40)
    assert(tor.select("ip").distinct().count() == 40)
    assert(tor.select("tor").distinct().count() == 4)
  }

  test("log lines have the expected schema") {
    assert(lines.columns.toSet == Set("recId", "sourceId", "ts", "raw"))
  }

  test("log line malformed rate is near the configured 5%") {
    val bad = lines.filter(!col("raw").startsWith("ts=")).count().toDouble / lines.count()
    assert(bad > 0.02 && bad < 0.09, s"malformed rate $bad")
  }

  test("valid log lines parse into complete JobStats") {
    val parsed = Queries.logParse(Queries.logFilter(lines))
    val n = parsed.count()
    assert(n > 0)
    assert(parsed.filter(col("tenant") === "" || col("bucket").isNull || col("cpu").isNull).count() == 0)
  }

  test("log latency buckets span the 0-30 range") {
    val parsed = Queries.logParse(Queries.logFilter(lines))
    val r = parsed.agg(min("bucket"), max("bucket")).collect()(0)
    assert(r.getLong(0) >= 0 && r.getLong(1) <= 29)
  }

  test("log lines are deterministic in the seed") {
    val again = MonitoringData.logLines(spark, 4, 8, 24, linesPerEpoch = 6)
    DfCompare.assertSameRows(lines, again, "logLines determinism")
  }
}
