package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite substrate generators, plus an exercise of the
  * DuckDB oracle itself on aggregate queries over them.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000)
  }

  test("orders keys are dense from 1..n") {
    val o = SynthData.orders(spark, 0.001)
    assert(o.count() == 1500)
    assert(o.agg(min("o_orderkey")).head.getLong(0) == 1L)
    assert(o.agg(max("o_orderkey")).head.getLong(0) == 1500L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, 0.001, seed = 3).collect().toSeq
    val b = SynthData.customer(spark, 0.001, seed = 3).collect().toSeq
    assert(a == b)
  }

  test("zipfKeys skews toward small keys") {
    val df   = SynthData.zipfKeys(spark, 20000, 1000)
    val ones = df.filter(col("k") === 1).count().toDouble
    val mid  = df.filter(col("k") === 500).count().toDouble
    assert(ones > mid * 5, s"zipf head $ones vs mid $mid")
  }

  test("uniformKeys covers the key range roughly evenly") {
    val df = SynthData.uniformKeys(spark, 20000, 10)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.min > 1200 && counts.max < 2800)
  }

  test("oracle: grouped aggregation over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, 0.001)
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast("string").as("n"))
      .select(col("l_returnflag"), col("n"))
    Oracle.assertEquivalent(
      got,
      "SELECT l_returnflag, CAST(count(*) AS VARCHAR) n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li,
    )
  }

  test("oracle: join + filter over orders/customer matches DuckDB") {
    val o = SynthData.orders(spark, 0.001)
    val c = SynthData.customer(spark, 0.001)
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .filter(col("c_mktsegment") === "BUILDING")
      .groupBy("o_orderstatus")
      .agg(count(lit(1)).cast("string").as("n"))
    Oracle.assertEquivalent(
      got,
      """SELECT o_orderstatus, CAST(count(*) AS VARCHAR) n
        |FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
        |WHERE c_mktsegment = 'BUILDING' GROUP BY o_orderstatus""".stripMargin,
      "orders" -> o, "customer" -> c,
    )
  }

  test("oracle catches a wrong result") {
    val li  = SynthData.lineitem(spark, 0.001)
    val bad = li.groupBy("l_returnflag").agg((count(lit(1)) + 1).cast("string").as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        bad,
        "SELECT l_returnflag, CAST(count(*) AS VARCHAR) n FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li,
      )
    }
  }
}
