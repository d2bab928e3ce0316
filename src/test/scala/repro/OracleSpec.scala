package repro

import org.apache.spark.sql.functions._

class OracleSpec extends SparkSpec {

  test("assertEquivalent passes for a matching aggregate") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li.groupBy("l_returnflag").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(got,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("assertEquivalent fails when the query differs") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val wrong = li.groupBy("l_returnflag").agg((count(lit(1)) + 1) as "cnt")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("assertEquivalent requires matching column names") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val misnamed = li.groupBy("l_returnflag").agg(count(lit(1)) as "n")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(misnamed,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }
}
