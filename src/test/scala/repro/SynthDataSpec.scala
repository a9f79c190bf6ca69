package repro

import org.apache.spark.sql.functions._

/** Sanity + oracle checks for the provided TPC-H-lite generators. */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001).agg(sum("o_custkey")).head().getLong(0)
    val b = SynthData.orders(spark, 0.001).agg(sum("o_custkey")).head().getLong(0)
    assert(a == b)
  }

  test("lineitem aggregate matches DuckDB (integer-exact columns)") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    try {
      val sparkDf = li.groupBy("l_returnflag")
        .agg(count(lit(1)).as("cnt"), sum("l_linenumber").as("sum_ln"))
      Oracle.assertEquivalent(
        sparkDf,
        """SELECT l_returnflag, count(*) AS cnt,
          |       sum(CAST(l_linenumber AS INT)) AS sum_ln
          |FROM lineitem GROUP BY l_returnflag""".stripMargin,
        "lineitem" -> li)
    } finally { li.unpersist(); () }
  }

  test("orders join customer cardinality matches DuckDB") {
    val o = SynthData.orders(spark, 0.001).cache()
    val c = SynthData.customer(spark, 0.01).cache()
    try {
      val sparkDf = o.join(c, o("o_custkey") === c("c_custkey"))
        .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
      Oracle.assertEquivalent(
        sparkDf,
        """SELECT c_mktsegment, count(*) AS cnt
          |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
          |GROUP BY c_mktsegment""".stripMargin,
        "orders" -> o, "customer" -> c)
    } finally { o.unpersist(); c.unpersist(); () }
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).head().getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).head().getLong(1)
    assert(z > u * 3, s"zipf top=$z uniform top=$u")
  }
}
