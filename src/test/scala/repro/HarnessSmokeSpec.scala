package repro

import org.apache.spark.sql.functions._

/** Smoke checks of the provided harness pieces (SynthData + Oracle) so a
  * broken base environment fails loudly before the RStore suites run.
  */
class HarnessSmokeSpec extends SparkSpec {

  test("SynthData.lineitem generates deterministic rows at tiny SF") {
    val a = SynthData.lineitem(spark, sf = 0.001).count()
    val b = SynthData.lineitem(spark, sf = 0.001).count()
    assert(a == b && a > 0)
  }

  test("Oracle validates a simple aggregation") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(500).cache()
    val agg = li.groupBy(col("l_returnflag"))
      .agg(count(lit(1)).as("cnt"))
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("Oracle catches a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(100).cache()
    val wrong = li.groupBy(col("l_returnflag"))
      .agg((count(lit(1)) + 1).as("cnt"))
      .select(col("l_returnflag"), col("cnt"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }
}
