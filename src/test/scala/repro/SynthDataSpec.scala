package repro

import org.apache.spark.sql.functions._

/** Smoke tests of the provided TPC-H-lite generators and the DuckDB
  * oracle plumbing (kept alongside the business-world generators).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator is deterministic and sized by SF") {
    val a = SynthData.lineitem(spark, sf = 0.001).cache()
    val b = SynthData.lineitem(spark, sf = 0.001)
    assert(a.count() === 6000)
    assert(a.agg(sum("l_quantity")).collect()(0).getDouble(0) ===
      b.agg(sum("l_quantity")).collect()(0).getDouble(0))
  }

  test("orders keys are unique and reference customers") {
    val o = SynthData.orders(spark, sf = 0.001).cache()
    assert(o.count() === 1500)
    assert(o.select("o_orderkey").distinct().count() === 1500)
    val maxCust = o.agg(max("o_custkey")).collect()(0).getLong(0)
    assert(maxCust <= 151)
  }

  test("oracle: lineitem aggregation matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(got,
      "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li.select("l_returnflag"))
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 100).groupBy("k").count()
      .orderBy(desc("count")).collect()
    val u = SynthData.uniformKeys(spark, 20000, 100).groupBy("k").count()
      .orderBy(desc("count")).collect()
    assert(z.head.getLong(1) > u.head.getLong(1) * 2)
  }
}
