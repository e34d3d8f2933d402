package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators + DuckDB oracle, exercised end to end
  * (they also back the key-distribution generators reused by graph tests).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001, seed = 7).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, 0.001, seed = 7).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a === b)
  }

  test("row counts scale with sf") {
    assert(SynthData.orders(spark, 0.001).count() === 1500L)
    assert(SynthData.customer(spark, 0.001).count() === 150L)
    assert(SynthData.part(spark, 0.001).count() === 200L)
  }

  test("aggregation query matches DuckDB (oracle)") {
    val li = SynthData.lineitem(spark, 0.001)
    val sparkDf = li
      .groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li
    )
  }

  test("join query matches DuckDB (oracle)") {
    val o = SynthData.orders(spark, 0.001)
    val c = SynthData.customer(spark, 0.001)
    val sparkDf = o
      .join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT c_mktsegment, count(*) AS cnt
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o,
      "customer" -> c
    )
  }

  test("zipf keys are skewed; uniform keys are not") {
    val zipf = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
    val uni = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
      top / 20000.0
    }
    assert(topShare(zipf) > 5 * topShare(uni))
  }
}
