package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators against the DuckDB oracle —
  * the result-equality harness every query-shaped check in this repo uses.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator: deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 9).agg(sum("l_quantity")).first.getDouble(0)
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 9).agg(sum("l_quantity")).first.getDouble(0)
    assert(a == b)
  }

  test("Oracle: grouped count over lineitem returnflag (Spark vs DuckDB)") {
    import spark.implicits._
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    try {
      val agg = li.groupBy($"l_returnflag").count()
        .select($"l_returnflag", $"count" as "cnt")
      Oracle.assertEquivalent(agg,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    } finally li.unpersist()
  }

  test("Oracle: join of orders and customer with grouped count (shuffle path)") {
    import spark.implicits._
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    try {
      val agg = o.join(c, o("o_custkey") === c("c_custkey"))
        .groupBy($"c_mktsegment").count()
        .select($"c_mktsegment", $"count" as "cnt")
      Oracle.assertEquivalent(agg,
        "SELECT c_mktsegment, count(*) AS cnt FROM orders " +
          "JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT) " +
          "GROUP BY c_mktsegment",
        "orders" -> o, "customer" -> c)
    } finally { o.unpersist(); c.unpersist() }
  }

  test("zipfKeys produces a skewed key distribution") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val counts = df.groupBy("k").count().orderBy(desc("count")).limit(5).collect()
    val total = 20000.0
    assert(counts.head.getLong(1) / total > 0.05, "top key should be heavy under zipf")
  }

  test("uniformKeys covers the key range roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.min > 20000 / 10 * 0.7)
  }
}
