package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle —
  * the shared substrate of this repo family. The ER generators in
  * `repro.data` follow the same determinism contract.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem at SF=0.001 has the scaled row count") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001).agg(sum("o_totalprice")).head().getDouble(0)
    val b = SynthData.orders(spark, 0.001).agg(sum("o_totalprice")).head().getDouble(0)
    assert(a == b)
  }

  test("orders keys are dense and join lineitem (oracle-checked aggregate)") {
    val li = SynthData.lineitem(spark, 0.001)
    val ord = SynthData.orders(spark, 0.001)
    val q = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus")
      .agg(count(lit(1)).as("n"))
      .orderBy("o_orderstatus")
    Oracle.assertEquivalent(
      q,
      "SELECT o_orderstatus, count(1) AS n FROM lineitem JOIN orders ON l_orderkey = o_orderkey " +
        "GROUP BY o_orderstatus ORDER BY o_orderstatus",
      "lineitem" -> li.select("l_orderkey"),
      "orders" -> ord.select("o_orderkey", "o_orderstatus"))
  }

  test("zipfKeys is skewed toward low keys (reference for the ER pools)") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, alpha = 1.1)
    val lowShare = df.where(col("k") <= 10).count().toDouble / 20000
    assert(lowShare > 0.3, s"low-key share $lowShare")
  }

  test("uniformKeys spreads keys evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 100)
    val counts = df.groupBy("k").count().agg(max("count"), min("count")).head()
    assert(counts.getLong(0) < 4 * math.max(1L, counts.getLong(1)))
  }
}
