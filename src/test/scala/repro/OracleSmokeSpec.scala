package repro

import org.apache.spark.sql.functions._

/** Sanity of the provided DuckDB oracle + TPC-H-lite generators themselves,
  * so a broken oracle cannot silently validate the reproduction.
  */
class OracleSmokeSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()

  test("oracle agrees on a simple aggregate") {
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum("l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(agg,
      """SELECT l_returnflag, count(*) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY 1""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle catches a wrong result") {
    val wrong = li.groupBy("l_returnflag").agg((count(lit(1)) + 1) as "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY 1",
        "lineitem" -> li)
    }
  }

  test("oracle catches a column-name mismatch") {
    val agg = li.groupBy("l_returnflag").agg(count(lit(1)) as "n")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(agg,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY 1",
        "lineitem" -> li)
    }
  }

  test("synthetic lineitem is deterministic in (sf, seed)") {
    val again = SynthData.lineitem(spark, sf = 0.002)
    DfCompare.assertSameRows(
      li.groupBy("l_returnflag").agg(round(sum("l_extendedprice"), 2) as "s"),
      again.groupBy("l_returnflag").agg(round(sum("l_extendedprice"), 2) as "s"),
    )
  }
}
