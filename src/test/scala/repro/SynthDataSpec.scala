package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators with the DuckDB oracle —
  * these feed nothing into the PPR pipeline but are part of the kit and
  * must stay deterministic and relationally sane.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000L)
    assert(SynthData.lineitem(spark, 0.0001).count() == 600L)
  }

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.0005, seed = 3).agg(sum("l_quantity")).head().getDouble(0)
    val b = SynthData.lineitem(spark, 0.0005, seed = 3).agg(sum("l_quantity")).head().getDouble(0)
    assert(a == b)
  }

  test("orders keys are dense 1..n") {
    val df = SynthData.orders(spark, 0.001)
    val n = df.count()
    assert(df.agg(min("o_orderkey"), max("o_orderkey")).head().toSeq == Seq(1L, n))
  }

  test("oracle: lineitem aggregate by returnflag matches DuckDB") {
    val li = SynthData.lineitem(spark, 0.0005)
    val sparkAgg = li.groupBy("l_returnflag")
      .agg(sum("l_quantity").as("qty"), count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT l_returnflag, sum(CAST(l_quantity AS DOUBLE)) AS qty, " +
        "count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle: orders join customer matches DuckDB") {
    val o = SynthData.orders(spark, 0.001)
    val c = SynthData.customer(spark, 0.001)
    val sparkJoin = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkJoin,
      "SELECT c_mktsegment, count(*) AS cnt FROM orders o " +
        "JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT) " +
        "GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c)
  }

  test("zipfKeys is skewed: top key far exceeds the median key count") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, alpha = 1.2)
    val counts = df.groupBy("k").count().orderBy(desc("count"))
      .limit(10).collect().map(_.getLong(1))
    assert(counts.head > 500, s"top key count ${counts.head}")
  }

  test("uniformKeys covers the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 100)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length > 95)
    assert(counts.max < 5 * counts.min, s"max=${counts.max} min=${counts.min}")
  }
}
