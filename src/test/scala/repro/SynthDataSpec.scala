package repro

import org.apache.spark.sql.functions._

/** Extended TPC-H-lite generators. */
class SynthDataSpec extends SparkSpec {

  private val sf = 0.001

  test("allTables returns the eight TPC-H-lite tables") {
    val ts = SynthData.allTables(spark, sf)
    assert(ts.keySet == Set("lineitem", "orders", "customer", "part",
      "supplier", "partsupp", "nation", "region"))
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.supplier(spark, sf).collect().toSeq
    val b = SynthData.supplier(spark, sf).collect().toSeq
    assert(a == b)
  }

  test("supplier scales with sf and has dense keys") {
    val s = SynthData.supplier(spark, sf)
    assert(s.count() == 10)
    assert(s.agg(min("s_suppkey"), max("s_suppkey")).collect()(0).toSeq == Seq(1L, 10L))
  }

  test("nation is the fixed 25-row dimension") {
    val n = SynthData.nation(spark)
    assert(n.count() == 25)
    assert(n.select("n_regionkey").distinct().count() == 5)
  }

  test("region is the fixed 5-row dimension") {
    assert(SynthData.region(spark).count() == 5)
  }

  test("partsupp has unique (ps_partkey, ps_suppkey) pairs within supplier range") {
    val ps = SynthData.partsupp(spark, sf)
    assert(ps.count() == ps.select("ps_partkey", "ps_suppkey").distinct().count())
    val maxSupp = ps.agg(max("ps_suppkey")).collect()(0).getLong(0)
    assert(maxSupp <= 10)
  }

  test("foreign keys land in the referenced key ranges") {
    val o = SynthData.orders(spark, sf)
    val nCust = SynthData.customer(spark, sf).count()
    val bad = o.where(col("o_custkey") < 1 || col("o_custkey") > nCust + 1).count()
    assert(bad == 0)
    val s = SynthData.supplier(spark, sf)
    assert(s.where(col("s_nationkey") < 0 || col("s_nationkey") > 24).count() == 0)
  }

  test("orders row count matches DuckDB count over the same generation — Oracle") {
    // Stringify (the lake model) — the oracle compares string cells, and
    // collecting typed generator rows trips Spark 4's date re-decoding.
    val o = repro.lake.Lake.stringify(SynthData.orders(spark, sf).limit(50)).cache()
    Oracle.assertEquivalent(
      o.groupBy("o_orderstatus").agg(count("*").as("n")),
      "SELECT o_orderstatus, count(*) AS n FROM orders GROUP BY o_orderstatus",
      "orders" -> o)
  }
}
