package repro.benchgen

import java.nio.file.Files
import org.apache.spark.sql.functions.col
import repro.SparkSpec
import repro.core.{GenT, Metrics}

/** T2D-Gold-style web benchmark (paper §VI-D). */
class WebBenchSpec extends SparkSpec {

  private lazy val bench: WebBench.Benchmark = {
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    WebBench.build(spark, Files.createTempDirectory("web").toString,
      nTables = 20, nReclaimable = 2, nDuplicatePairs = 3)
  }

  test("corpus contains base tables, fragments, supersets, and duplicates") {
    val names = bench.repo.tableNames
    assert(names.count(_.matches("web_\\d+")) == 20)
    // 2 reclaimable × 2-3 vertical slices (3 or 4 attributes per table)
    val frags = names.count(_.contains("_frag_"))
    assert(frags >= 4 && frags <= 6, s"got $frags")
    assert(names.count(_.endsWith("_super")) == 2)
    assert(names.count(_.endsWith("_dup")) == 3)
  }

  test("fragments of a reclaimable table cover it exactly") {
    val base = bench.repo.read("web_0").df
    val frags = bench.repo.tableNames.filter(_.startsWith("web_0_frag_"))
      .map(bench.repo.read(_).df)
    val fd = repro.core.Fd.fullDisjunction(frags).get
    assert(fd.select(base.columns.map(col): _*).collect().toSet ==
      base.collect().toSet)
  }

  test("superset version carries corrupted cells and extra rows") {
    val base = bench.repo.read("web_0").df
    val sup = bench.repo.read("web_0_super").df
    assert(sup.count() > base.count())
    assert(sup.collect().flatMap(_.toSeq).count {
      case s: String => s.startsWith("ERR_"); case _ => false
    } > 0)
  }

  test("every source has a declared single-column key with unique values") {
    bench.sources.foreach { s =>
      assert(s.keys.size == 1)
      assert(s.df.select(s.keys.head).distinct().count() == s.df.count())
    }
  }

  test("Gen-T reclaims a planted reclaimable source from its fragments (self excluded)") {
    val src = bench.sources.find(_.name == "web_0").get
    val idx = bench.index.where(col("table") =!= "web_0")
    val r = GenT.reclaim(bench.repo, idx, src, spark)
    val s = Metrics.all(r.reclaimed, src)
    assert(s.recall >= 0.99, s"$s orig=${r.originating}")
    assert(s.precision >= 0.99, s"$s orig=${r.originating}")
    assert(r.originating.size > 1, s"expected multi-table integration, got ${r.originating}")
  }

  test("Gen-T finds the duplicate for a duplicated source") {
    val dupBase = bench.duplicates.find(!_.endsWith("_dup")).get
    val src = bench.sources.find(_.name == dupBase).get
    val idx = bench.index.where(col("table") =!= dupBase)
    val r = GenT.reclaim(bench.repo, idx, src, spark)
    val s = Metrics.all(r.reclaimed, src)
    assert(s.perfect, s"$s orig=${r.originating}")
    assert(r.originating.contains(s"${dupBase}_dup"), s"got ${r.originating}")
  }

  test("an unrelated source is not reclaimable") {
    // web_10.. are unrelated (no fragments, no duplicates).
    val src = bench.sources.find(_.name == "web_10").get
    val idx = bench.index.where(col("table") =!= "web_10")
    val r = GenT.reclaim(bench.repo, idx, src, spark)
    val s = Metrics.all(r.reclaimed, src)
    assert(s.recall < 0.5, s"$s orig=${r.originating}")
  }

  test("WDC variant embeds distractor tables") {
    val wdc = WebBench.build(spark, Files.createTempDirectory("wdc").toString,
      nTables = 5, nReclaimable = 1, nDuplicatePairs = 1, distractors = 10)
    assert(wdc.repo.tableNames.count(_.startsWith("distractor_")) == 10)
  }

  test("benchmark build is deterministic in seed") {
    val a = WebBench.build(spark, Files.createTempDirectory("webd1").toString,
      nTables = 5, nReclaimable = 1, nDuplicatePairs = 1, seed = 9)
    val b = WebBench.build(spark, Files.createTempDirectory("webd2").toString,
      nTables = 5, nReclaimable = 1, nDuplicatePairs = 1, seed = 9)
    assert(a.repo.read("web_3").df.collect().toSet == b.repo.read("web_3").df.collect().toSet)
  }
}
