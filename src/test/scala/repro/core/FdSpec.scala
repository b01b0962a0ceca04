package repro.core

import repro.{Fixtures, Oracle, SparkSpec}

/** Full Disjunction substrate (ALITE baseline). */
class FdSpec extends SparkSpec {

  private val N: String = null
  private def df(cols: Seq[String], rows: Seq[Seq[String]]) =
    Fixtures.stringDf(spark, cols, rows)

  test("FD of two key-joined tables equals the full outer join — against DuckDB") {
    val t1 = df(Seq("k", "a"), Seq(Seq("1", "a1"), Seq("2", "a2")))
    val t2 = df(Seq("k", "b"), Seq(Seq("2", "b2"), Seq("3", "b3")))
    val fd = Fd.fullDisjunction(Seq(t1, t2)).get
    Oracle.assertEquivalent(
      fd.select("k", "a", "b"),
      "SELECT COALESCE(t1.k, t2.k) AS k, a, b FROM t1 FULL JOIN t2 ON t1.k = t2.k",
      "t1" -> t1, "t2" -> t2)
  }

  test("FD closure keeps originals until subsumed (multi-match joins)") {
    val t1 = df(Seq("k", "a"), Seq(Seq("1", "a1")))
    val t2 = df(Seq("k", "b"), Seq(Seq("1", "b1"), Seq("1", "b2")))
    val fd = Fd.fullDisjunction(Seq(t1, t2)).get.collect()
      .map(r => (r.getString(0), r.getString(1), r.getString(2))).toSet
    // Both combinations exist; the originals are subsumed away.
    assert(fd == Set(("1", "a1", "b1"), ("1", "a1", "b2")))
  }

  test("FD of three chained tables combines transitively") {
    val t1 = df(Seq("k", "a"), Seq(Seq("1", "a1")))
    val t2 = df(Seq("k", "b"), Seq(Seq("1", "b1")))
    val t3 = df(Seq("b", "c"), Seq(Seq("b1", "c1")))
    val fd = Fd.fullDisjunction(Seq(t1, t2, t3)).get.collect()
    assert(fd.length == 1)
    val r = fd(0)
    assert(Seq("k", "a", "b", "c").map(c => r.getString(r.fieldIndex(c))) ==
      Seq("1", "a1", "b1", "c1"))
  }

  test("FD row cap returns None (timeout modelling)") {
    val big = spark.range(100).selectExpr("cast(id as string) as k", "'x' as a")
    assert(Fd.fullDisjunction(Seq(big), Fd.Config(rowCap = 10)).isEmpty)
  }

  test("FD pair-check cap returns None") {
    val t = df(Seq("k", "a"), (1 to 40).map(i => Seq("1", s"a$i")))
    assert(Fd.closure(
      t.collect().toIndexedSeq.map(r => Seq(r.getString(0), r.getString(1))),
      Fd.Config(maxPairChecks = 5)).isEmpty)
  }

  test("FD of disjoint-schema tables is their outer union") {
    val t1 = df(Seq("a"), Seq(Seq("x")))
    val t2 = df(Seq("b"), Seq(Seq("y")))
    val fd = Fd.fullDisjunction(Seq(t1, t2)).get.collect()
      .map(r => (r.getString(0), r.getString(1))).toSet
    assert(fd == Set(("x", null), (null, "y")))
  }

  test("closure is idempotent on an already-minimal instance") {
    val rows = Seq(Seq("1", "a", N), Seq("2", N, "b"))
    val out = Fd.closure(rows).get
    assert(out.toSet == rows.toSet)
  }

  test("closure deduplicates input rows") {
    val rows = Seq(Seq("1", "a"), Seq("1", "a"))
    assert(Fd.closure(rows).get.size == 1)
  }
}
