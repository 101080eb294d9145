package repro

import repro.nexmark.NexmarkConfig

/** The provided TPC-H-lite generators plus the NexMark extension, checked
  * against DuckDB via the Oracle (demonstrates the oracle wiring end to
  * end on Spark SQL aggregations).
  */
class SynthDataSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  test("lineitem aggregate matches DuckDB (oracle wiring)") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val agg = li.groupBy(col("l_returnflag"))
      .agg(count(lit(1)) as "cnt", round(sum(col("l_quantity")), 2) as "qty")
      .select(col("l_returnflag"), col("cnt"), col("qty"))
    Oracle.assertEquivalent(agg,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("orders-customer join matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    val q = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy(col("c_mktsegment")).agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(q,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders o JOIN customer c
        |  ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("nexmark extension exposes the three streams as DataFrames") {
    val cfg = NexmarkConfig(500.0, 5_000_000L, seed = 5L)
    val p = SynthData.nexmarkPersons(spark, cfg)
    val a = SynthData.nexmarkAuctions(spark, cfg)
    val b = SynthData.nexmarkBids(spark, cfg)
    assert(p.columns.toSet == Set("id", "name", "city", "state", "ts"))
    assert(a.columns.toSet == Set("id", "seller", "category", "ts", "expires"))
    assert(b.columns.toSet == Set("auction", "bidder", "price", "ts"))
    val total = p.count() + a.count() + b.count()
    assert(total == 2500L)
  }

  test("nexmark DataFrames are deterministic in the config") {
    val cfg = NexmarkConfig(200.0, 5_000_000L, seed = 9L)
    val c1 = SynthData.nexmarkBids(spark, cfg).collect().toSeq
    val c2 = SynthData.nexmarkBids(spark, cfg).collect().toSeq
    assert(c1 == c2)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(col("count").desc).limit(1).collect()(0).getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(col("count").desc).limit(1).collect()(0).getLong(1)
    assert(z > 3 * u, s"zipf top=$z uniform top=$u")
  }
}
