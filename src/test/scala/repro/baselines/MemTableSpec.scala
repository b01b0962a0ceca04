package repro.baselines

import repro.{Fixtures, SparkSpec}

/** The in-memory table substrate used by Auto-Pipeline* and Ver. */
class MemTableSpec extends SparkSpec {

  private val N: String = null
  private val t1 = MemTable(Vector("k", "a"),
    Vector(Vector("1", "a1"), Vector("2", "a2")))
  private val t2 = MemTable(Vector("k", "b"),
    Vector(Vector("2", "b2"), Vector("3", "b3")))

  test("fromDf/toDf round-trip preserves rows and nulls") {
    val df = Fixtures.stringDf(spark, Seq("k", "a"), Seq(Seq("1", N), Seq("2", "x")))
    val t = MemTable.fromDf(df, 100).get
    val back = MemTable.toDf(t, spark).collect()
      .map(r => (r.getString(0), r.getString(1))).toSet
    assert(back == Set(("1", null), ("2", "x")))
  }

  test("fromDf respects the row cap (timeout modelling)") {
    val df = spark.range(50).selectExpr("cast(id as string) as k")
    assert(MemTable.fromDf(df, 10).isEmpty)
    assert(MemTable.fromDf(df, 50).isDefined)
  }

  test("inner natural join") {
    val j = t1.naturalJoin(t2, "inner")
    assert(j.cols == Vector("k", "a", "b"))
    assert(j.rows.toSet == Set(Vector("2", "a2", "b2")))
  }

  test("left natural join keeps unmatched left rows") {
    val j = t1.naturalJoin(t2, "left")
    assert(j.rows.toSet == Set(Vector("1", "a1", null), Vector("2", "a2", "b2")))
  }

  test("full natural join keeps both sides") {
    val j = t1.naturalJoin(t2, "full")
    assert(j.rows.toSet == Set(
      Vector("1", "a1", null), Vector("2", "a2", "b2"), Vector("3", null, "b3")))
  }

  test("join with null key never matches") {
    val withNull = MemTable(Vector("k", "a"), Vector(Vector(null, "ax")))
    val j = withNull.naturalJoin(t2, "inner")
    assert(j.rows.isEmpty)
  }

  test("outer union pads and dedupes") {
    val u = t1.outerUnion(t2)
    assert(u.cols == Vector("k", "a", "b"))
    assert(u.rows.size == 4)
  }

  test("project keeps requested columns in order, dropping unknown ones") {
    val p = t1.project(Seq("a", "zzz"))
    assert(p.cols == Vector("a"))
  }

  test("selectKeys filters to the given key set") {
    val s = t1.selectKeys(Seq("k"), Set(Vector("2")))
    assert(s.rows == Vector(Vector("2", "a2")))
  }

  test("padTo adds null columns") {
    val p = t1.padTo(Seq("k", "a", "extra"))
    assert(p.cols == Vector("k", "a", "extra"))
    assert(p.rows.forall(_.last == null))
  }

  test("in-memory EIS matches the Spark implementation on Example 6") {
    val source = Fixtures.figure3Source(spark)
    val srcMem = MemTable.fromDf(source.df, 100).get
    val s1 = MemTable.fromDf(Fixtures.sHat1(spark), 100).get
    val s2 = MemTable.fromDf(Fixtures.sHat2(spark), 100).get
    assert(math.abs(MemTable.eis(s1, srcMem, Seq("ID")) - 0.875) < 1e-9)
    assert(math.abs(MemTable.eis(s2, srcMem, Seq("ID")) - 0.9166667) < 1e-6)
  }
}
