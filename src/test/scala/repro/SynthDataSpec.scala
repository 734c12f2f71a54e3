package repro

import org.apache.spark.sql.functions._

/** Sanity coverage for the provided synthetic-data substrate and the DuckDB
  * oracle wiring (the benchmark generators build on the same SparkSession
  * and oracle plumbing).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem scales with the scale factor") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000)
  }

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.0005, seed = 7).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, 0.0005, seed = 7).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("orders keys are dense and unique") {
    val o = SynthData.orders(spark, 0.001)
    assert(o.count() == o.select("o_orderkey").distinct().count())
  }

  test("zipf keys are skewed toward the head") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, seed = 3)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(top > 20000 / 1000 * 5, s"head key count $top not skewed")
  }

  test("uniform keys stay within range") {
    val u = SynthData.uniformKeys(spark, 1000, 50)
    val mm = u.agg(min("k"), max("k")).collect()(0)
    assert(mm.getLong(0) >= 1 && mm.getLong(1) <= 51)
  }

  test("oracle agrees with Spark on a grouped aggregate") {
    val cust = SynthData.customer(spark, 0.005)
    val q = cust.groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      q,
      "SELECT c_mktsegment, count(*) AS n FROM customer GROUP BY c_mktsegment",
      "customer" -> cust,
    )
  }

  test("oracle catches a wrong result") {
    val cust = SynthData.customer(spark, 0.005)
    val wrong = cust.groupBy("c_mktsegment").agg((count(lit(1)) + 1).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT c_mktsegment, count(*) AS n FROM customer GROUP BY c_mktsegment",
        "customer" -> cust,
      )
    }
  }
}
