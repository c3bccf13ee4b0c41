package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle on
  * plain Spark SQL — infrastructure sanity for the rest of the suite.
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_quantity")).head.getDouble(0)
    val b = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_quantity")).head.getDouble(0)
    assert(a == b)
  }

  test("oracle: grouped aggregate over lineitem matches DuckDB") {
    // Project to the needed columns (DateType rows fail to decode on this
    // JVM when collected for the oracle, and the query doesn't use them).
    val li = SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_quantity")
    val q = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum("l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(q,
      "SELECT l_returnflag, count(*) AS cnt, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
      "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle: join between orders and customer matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).select("o_custkey")
    val c = SynthData.customer(spark, sf = 0.001).select("c_custkey", "c_mktsegment")
    val q = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(q,
      "SELECT c_mktsegment, count(*) AS n FROM orders JOIN customer " +
      "ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT) GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed toward low ranks") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 100)
    val top = df.groupBy("k").count().orderBy(desc("count")).limit(1).head
    assert(top.getLong(0) <= 3, s"most frequent key should be a low rank, got ${top.getLong(0)}")
  }

  test("uniform keys cover the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.min > 1000 && counts.max < 3000)
  }
}
