package repro.discovery

import repro.{Fixtures, SparkSpec}

/** Expand (Algorithm 5): giving keyless candidates the source key. */
class ExpandSpec extends SparkSpec {

  private lazy val source = Fixtures.figure3Source(spark)

  test("keyed candidates pass through unchanged") {
    val a = Fixtures.tableA(spark)
    val out = Expand.expandAll(Seq("A" -> a), source, Map.empty)
    assert(out.map(_.name) == Seq("A"))
    assert(out.head.parts == Seq("A"))
  }

  test("keyless candidate joins through a keyed one on the best column") {
    val a = Fixtures.tableA(spark)
    val b = Fixtures.tableB(spark)
    val weights = Map(("A", "B") -> Map("Name" -> 1.0))
    val out = Expand.expandAll(Seq("A" -> a, "B" -> b), source, weights)
    val expandedB = out.find(_.parts.contains("B")).get
    assert(expandedB.df.columns.contains("ID"))
    assert(expandedB.df.count() == 3)
    val row = expandedB.df.filter(expandedB.df("Name") === "Smith").collect()(0)
    assert(row.getString(row.fieldIndex("Age")) == "27")
    assert(row.getString(row.fieldIndex("ID")) == "0")
  }

  test("keyless candidate with no join path is dropped") {
    val a = Fixtures.tableA(spark)
    val lonely = Fixtures.stringDf(spark, Seq("Other"), Seq(Seq("zzz")))
    val out = Expand.expandAll(Seq("A" -> a, "L" -> lonely), source, Map.empty)
    assert(out.map(_.name) == Seq("A"))
  }

  test("joinCoalesce merges duplicate columns without dropping null-mismatched rows") {
    val a = Fixtures.tableA(spark) // (ID, Name, Education)
    val d = Fixtures.tableD(spark) // (Name, Age, Gender, Education)
    val j = Expand.joinCoalesce(d, a, "Name")
    assert(j.count() == 3)
    val wang = j.filter(j("Name") === "Wang").collect()(0)
    // D has null Education for Wang; A supplies HighSchool via coalesce.
    assert(wang.getString(wang.fieldIndex("Education")) == "HighSchool")
    val brown = j.filter(j("Name") === "Brown").collect()(0)
    // D has Masters, A has null: left side wins.
    assert(brown.getString(brown.fieldIndex("Education")) == "Masters")
  }

  test("path of length three reaches the key through an intermediate table") {
    val a = Fixtures.stringDf(spark, Seq("ID", "X"), Seq(Seq("0", "x0"), Seq("1", "x1")))
    val mid = Fixtures.stringDf(spark, Seq("X", "Y"), Seq(Seq("x0", "y0"), Seq("x1", "y1")))
    val far = Fixtures.stringDf(spark, Seq("Y", "Z"), Seq(Seq("y0", "z0"), Seq("y1", "z1")))
    val src = repro.lake.SourceTable("s",
      Fixtures.stringDf(spark, Seq("ID", "X", "Y", "Z"),
        Seq(Seq("0", "x0", "y0", "z0"))), Seq("ID"))
    val weights = Map(
      ("A", "M") -> Map("X" -> 1.0),
      ("M", "F") -> Map("Y" -> 1.0))
    val out = Expand.expandAll(Seq("A" -> a, "M" -> mid, "F" -> far), src, weights)
    val expandedFar = out.find(_.parts.contains("F"))
    assert(expandedFar.isDefined, s"got ${out.map(_.name)}")
    assert(expandedFar.get.df.columns.contains("ID"))
    assert(expandedFar.get.df.count() == 2)
  }
}
