package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.benchgen.{TpTr, WebBench}
import repro.harness.Harness

/** Shared plumbing for the spark-submit entrypoints (one per paper
  * table). Usage:
  *
  * {{{
  * spark-submit --class repro.jobs.TableIIJob <jar> [workDir]
  * }}}
  *
  * `workDir` (default /tmp/gen-t-repro) holds the generated Parquet
  * lakes; rerunning reuses them. Jobs run at larger scales than the
  * bench suites (see DESIGN.md §5).
  */
object JobSupport {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "16"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("ERROR")
    s
  }

  def workDir(args: Array[String]): String =
    args.headOption.getOrElse("/tmp/gen-t-repro")
}

/** Table I: benchmark lake statistics. */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("gen-t-table1")
    val w = JobSupport.workDir(args)
    val benches = Seq(
      "TP-TR Small" -> TpTr.build(spark, s"$w/tptr_small", TpTr.Small).repo,
      "TP-TR Med" -> TpTr.build(spark, s"$w/tptr_med", TpTr.Med).repo,
      "TP-TR Large" -> TpTr.build(spark, s"$w/tptr_large_full", TpTr.LargeFull).repo,
      "SANTOS +TP-TR Med" -> TpTr.build(spark, s"$w/santos_med", TpTr.Med,
        distractors = 3000).repo,
      "T2D Gold (web)" -> WebBench.build(spark, s"$w/t2d", nTables = 60).repo,
      "WDC +T2D Gold" -> WebBench.build(spark, s"$w/wdc", nTables = 60,
        distractors = 1500).repo)
    println(f"${"Benchmark"}%-22s ${"#Tables"}%8s ${"#Cols"}%8s ${"AvgRows"}%9s")
    benches.foreach { case (name, repo) =>
      val ts = repo.allTables
      val rows = ts.map(_.df.count())
      println(f"$name%-22s ${ts.size}%8d ${ts.map(_.columns.size).sum}%8d " +
        f"${if (rows.isEmpty) 0L else rows.sum / rows.size}%9d")
    }
    spark.stop()
  }
}

/** Table II: ALITE / ALITE-PS / Gen-T on the larger TP-TR benchmarks. */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("gen-t-table2")
    val w = JobSupport.workDir(args)
    for ((title, bench) <- Seq(
        "TP-TR Med" -> TpTr.build(spark, s"$w/tptr_med", TpTr.Med),
        "SANTOS +TP-TR Med" -> TpTr.build(spark, s"$w/santos_med", TpTr.Med,
          distractors = 3000),
        "TP-TR Large" -> TpTr.build(spark, s"$w/tptr_large_full", TpTr.LargeFull))) {
      val runs = Harness.runAll(spark, bench.repo, bench.index, bench.sources,
        bench.intSets, Harness.TableIIMethods)
      println(Harness.format(s"Table II: $title", Harness.aggregate(runs),
        Harness.TableIIMethods.map(_.label)))
    }
    spark.stop()
  }
}

/** Table III: all methods on TP-TR Small. */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("gen-t-table3")
    val w = JobSupport.workDir(args)
    val bench = TpTr.build(spark, s"$w/tptr_small", TpTr.Small)
    val runs = Harness.runAll(spark, bench.repo, bench.index, bench.sources,
      bench.intSets, Harness.TableIIIMethods)
    println(Harness.format("Table III: TP-TR Small", Harness.aggregate(runs),
      Harness.TableIIIMethods.map(_.label)))
    spark.stop()
  }
}

/** Table IV: the web corpus, every table iterated as a source. */
object TableIVJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("gen-t-table4")
    val w = JobSupport.workDir(args)
    val bench = WebBench.build(spark, s"$w/wdc", nTables = 60, distractors = 1500)
    val runs = Harness.runAll(spark, bench.repo, bench.index, bench.sources,
      Map.empty, Harness.TableIVMethods, Harness.RunConfig(excludeSelf = true))
    val common = runs.groupBy(_.source).collect {
      case (s, rs) if rs.forall(_.scores.exists(_.outputCells > 0)) => s
    }.toSet
    println(Harness.format(s"Table IV: web corpus (${common.size} common sources)",
      Harness.aggregate(runs.filter(r => common.contains(r.source))),
      Harness.TableIVMethods.map(_.label)))
    spark.stop()
  }
}
