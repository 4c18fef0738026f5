package repro

import org.apache.spark.sql.functions._

/** Exercises the provided synthetic-data generators (and the DuckDB oracle
  * plumbing) — the zipf generator idiom is what GraphGen's degree skew is
  * built on.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000)
  }

  test("orders keys are dense 1..N") {
    val df = SynthData.orders(spark, sf = 0.001)
    val n = df.count()
    val agg = df.agg(min("o_orderkey").as("lo"), max("o_orderkey").as("hi")).collect()(0)
    assert(agg.getLong(0) == 1 && agg.getLong(1) == n)
  }

  test("customer segment aggregation matches DuckDB") {
    val df = SynthData.customer(spark, sf = 0.005)
    val agg = df.groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(agg,
      "SELECT c_mktsegment, count(*) AS cnt FROM customer GROUP BY c_mktsegment",
      "customer" -> df)
  }

  test("lineitem revenue aggregate matches DuckDB") {
    val df = SynthData.lineitem(spark, sf = 0.001)
    val agg = df.agg(round(sum(col("l_extendedprice") * (lit(1) - col("l_discount"))), 2).as("rev"))
    Oracle.assertEquivalent(agg,
      "SELECT round(sum(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))), 2) AS rev " +
        "FROM lineitem",
      "lineitem" -> df)
  }

  test("zipfKeys is heavy-tailed: rank-1 key dominates") {
    val df = SynthData.zipfKeys(spark, rows = 50000, nKeys = 1000, alpha = 1.1)
    val top = df.groupBy("k").agg(count(lit(1)).as("c")).orderBy(desc("c")).limit(1).collect()(0)
    assert(top.getLong(1) > 50000 / 100, s"top key count=${top.getLong(1)}")
  }

  test("uniformKeys covers the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = df.groupBy("k").agg(count(lit(1)).as("c")).collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.min > 20000 / 10 * 0.7 && counts.max < 20000 / 10 * 1.3)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, sf = 0.001, seed = 5).collect().map(_.toString).sorted
    val b = SynthData.part(spark, sf = 0.001, seed = 5).collect().map(_.toString).sorted
    assert(a sameElements b)
  }
}
