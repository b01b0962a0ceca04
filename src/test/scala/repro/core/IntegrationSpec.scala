package repro.core

import repro.{Fixtures, SparkSpec}
import repro.discovery.Expand
import repro.lake.SourceTable

/** Table Integration (Algorithm 2). */
class IntegrationSpec extends SparkSpec {

  private val N: String = null
  private lazy val source = Fixtures.figure3Source(spark)

  private def expanded(names: String*): Seq[Expand.Expanded] = {
    val all = Map(
      "A" -> Fixtures.tableA(spark), "B" -> Fixtures.tableB(spark),
      "C" -> Fixtures.tableC(spark), "D" -> Fixtures.tableD(spark))
    val w = Map(
      ("A", "B") -> Map("Name" -> 1.0),
      ("A", "C") -> Map("Name" -> 1.0),
      ("A", "D") -> Map("Name" -> 1.0))
    Expand.expandAll(names.map(n => n -> all(n)), source, w)
  }

  test("labeledSource replaces nulls with deterministic tokens") {
    val lab = Integration.labeledSource(source)
    val smith = lab.df.filter(lab.df("ID") === "0").collect()(0)
    val g = smith.getString(smith.fieldIndex("Gender"))
    assert(g != null && g.startsWith(Integration.NullLabelPrefix))
    // Non-null cells unchanged.
    assert(smith.getString(smith.fieldIndex("Name")) == "Smith")
  }

  test("labelNulls labels only cells null in BOTH table and source") {
    val a = Fixtures.tableA(spark) // Brown's Education is null; S has Masters
    val lab = Integration.labelNulls(a, source)
    val brown = lab.filter(lab("Name") === "Brown").collect()(0)
    // S has Masters there → stays a real null (so κ can fill it later).
    assert(brown.getString(brown.fieldIndex("Education")) == null)
  }

  test("labelNulls labels a shared null so it cannot be over-combined") {
    val d = Expand.joinCoalesce(Fixtures.tableD(spark), Fixtures.tableA(spark), "Name")
    val lab = Integration.labelNulls(d, source)
    val smith = lab.filter(lab("Name") === "Smith").collect()(0)
    val g = smith.getString(smith.fieldIndex("Gender"))
    // D's Smith Gender is null and S's is null → labeled.
    assert(g != null && g.startsWith(Integration.NullLabelPrefix))
  }

  test("removeLabeledNulls restores nulls and only nulls") {
    val lab = Integration.labeledSource(source)
    val back = Integration.removeLabeledNulls(lab.df)
    assert(back.collect().toSet == source.df.collect().toSet)
  }

  test("integrating A, B, D reclaims the Figure 3 source exactly") {
    val tabs = expanded("A", "B", "D").map(_.df)
    val out = Integration.integrate(tabs, source)
    assert(out.collect().toSet == source.df.collect().toSet)
  }

  test("integrating A and D alone also reclaims the source exactly") {
    val out = Integration.integrate(expanded("A", "D").map(_.df), source)
    assert(out.collect().toSet == source.df.collect().toSet)
  }

  test("integrating with contradicting C keeps erroneous tuples separate, not merged") {
    val out = Integration.integrate(expanded("A", "B", "C", "D").map(_.df), source)
    // Every source tuple must still be reclaimed exactly (EIS guard keeps
    // the correct tuples); extra C-derived tuples may exist.
    val outRows = out.collect().toSet
    source.df.collect().foreach(r => assert(outRows.contains(r), s"missing $r"))
  }

  test("integration output always has the source schema") {
    val onlyA = expanded("A").map(_.df)
    val out = Integration.integrate(onlyA, source)
    assert(out.columns.toSeq == source.df.columns.toSeq)
  }

  test("integration of an empty table set is the empty source-shaped table") {
    val out = Integration.integrate(Seq.empty, source)
    assert(out.columns.toSeq == source.df.columns.toSeq)
    assert(out.count() == 0)
  }

  test("conditional subsumption does not remove a tuple that matches a source null") {
    // Source row (1, x, ⊥); tables offer (1, x, ⊥) [correct] and (1, x, y)
    // [over-complete]. Without null labeling, β would subsume the correct
    // tuple away; the guard must keep a tuple matching the source exactly.
    val src = SourceTable("s",
      Fixtures.stringDf(spark, Seq("k", "a", "b"), Seq(Seq("1", "x", N))), Seq("k"))
    val tGood = Fixtures.stringDf(spark, Seq("k", "a", "b"), Seq(Seq("1", "x", N)))
    val tOver = Fixtures.stringDf(spark, Seq("k", "a", "b"), Seq(Seq("1", "x", "y")))
    val out = Integration.integrate(Seq(tGood, tOver), src)
    val rows = out.collect().map(r => (r.getString(0), r.getString(1), r.getString(2))).toSet
    assert(rows.contains(("1", "x", null)), s"got $rows")
  }
}
