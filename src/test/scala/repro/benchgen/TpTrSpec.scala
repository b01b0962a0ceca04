package repro.benchgen

import java.nio.file.Files
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.{GenT, Metrics}
import repro.lake.Lake

/** TP-TR benchmark generator + a Small-scale end-to-end Gen-T smoke test. */
class TpTrSpec extends SparkSpec {

  private lazy val bench: TpTr.Benchmark = {
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    TpTr.build(spark, Files.createTempDirectory("tptr").toString, TpTr.Small)
  }

  test("lake has 32 tables: 4 versions of each of the 8 TPC-H-lite tables") {
    assert(bench.repo.tableNames.size == 32)
    val bases = Seq("lineitem", "orders", "customer", "part",
      "supplier", "partsupp", "nation", "region")
    bases.foreach { b =>
      Seq("n1", "n2", "e1", "e2").foreach(v =>
        assert(bench.repo.exists(s"${b}_$v"), s"missing ${b}_$v"))
    }
  }

  test("there are 26 source tables with declared keys") {
    assert(bench.sources.size == 26)
    bench.sources.foreach(s => assert(s.keys.nonEmpty))
  }

  test("source tables are small at Small scale (paper: avg 27 rows)") {
    val counts = bench.sources.map(_.df.count())
    assert(counts.forall(_ > 0), s"empty source: ${bench.sources.map(_.name).zip(counts)}")
    assert(counts.max <= 100, s"too large for Small: ${counts.max}")
  }

  test("source keys are unique and non-null (reclamation precondition)") {
    bench.sources.foreach { s =>
      val n = s.df.count()
      val k = s.df.select(s.keys.map(org.apache.spark.sql.functions.col): _*)
      assert(k.na.drop().count() == n, s"${s.name}: null keys")
      assert(k.distinct().count() == n, s"${s.name}: duplicate keys")
    }
  }

  test("integrating sets list the four versions of each touched base table") {
    val is = bench.intSets("q12_orders_customer")
    assert(is.toSet == Set("orders_n1", "orders_n2", "orders_e1", "orders_e2",
      "customer_n1", "customer_n2", "customer_e1", "customer_e2"))
  }

  test("q12 source equals the DuckDB join over the originals — Oracle") {
    val originals = SynthData.allTables(spark, TpTr.Small.sf)
      .map { case (k, v) => k -> Lake.stringify(v) }
    val q12 = TpTr.queries(TpTr.Small).find(_.name == "q12_orders_customer").get
    Oracle.assertEquivalent(
      q12.build(originals),
      """SELECT o_orderkey, o_custkey, o_totalprice, c_nationkey, c_mktsegment
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |WHERE CAST(o_orderkey AS INT) <= 30""".stripMargin,
      "orders" -> originals("orders"), "customer" -> originals("customer"))
  }

  test("q22 full-outer source contains null cells (exercises labeled nulls)") {
    val q22 = bench.sources.find(_.name == "q22_orders_fullouter_customer").get
    val nulls = q22.df.collect().flatMap(_.toSeq).count(_ == null)
    assert(nulls > 0)
  }

  test("benchmark build is idempotent (reuses the on-disk lake)") {
    val again = TpTr.build(spark, bench.repo.root, TpTr.Small)
    assert(again.repo.tableNames == bench.repo.tableNames)
  }

  test("Gen-T perfectly reclaims a single-table source (q01) at Small scale") {
    val src = bench.sources.find(_.name == "q01_customer").get
    val r = GenT.reclaim(bench.repo, bench.index, src, spark)
    val s = Metrics.all(r.reclaimed, src)
    assert(s.recall >= 0.99, s"$s orig=${r.originating}")
    assert(s.precision >= 0.99, s"$s orig=${r.originating}")
    // Originating tables should be the nullified versions, not erroneous.
    assert(!r.originating.exists(_.contains("_e")), s"got ${r.originating}")
  }

  test("Gen-T reclaims a join source (q12) with high recall at Small scale") {
    val src = bench.sources.find(_.name == "q12_orders_customer").get
    val r = GenT.reclaim(bench.repo, bench.index, src, spark)
    val s = Metrics.all(r.reclaimed, src)
    assert(s.recall >= 0.5, s"$s orig=${r.originating}")
    assert(s.eis >= 0.7, s"$s")
  }
}
