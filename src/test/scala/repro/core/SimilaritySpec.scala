package repro.core

import repro.{Fixtures, SparkSpec}
import repro.lake.SourceTable

/** EIS and instance similarity — pinned to the paper's Example 6 numbers. */
class SimilaritySpec extends SparkSpec {

  private lazy val source = Fixtures.figure3Source(spark)

  test("instance similarity of Ŝ1 is 0.833 (Example 6)") {
    val v = Similarity.instanceSimilarity(Fixtures.sHat1(spark), source)
    assert(math.abs(v - 0.8333333) < 1e-6, s"got $v")
  }

  test("instance similarity of Ŝ2 is 0.75 (Example 6)") {
    val v = Similarity.instanceSimilarity(Fixtures.sHat2(spark), source)
    assert(math.abs(v - 0.75) < 1e-6, s"got $v")
  }

  test("EIS of Ŝ1 is 0.875 (Example 6)") {
    val v = Similarity.eis(Fixtures.sHat1(spark), source)
    assert(math.abs(v - 0.875) < 1e-6, s"got $v")
  }

  test("EIS of Ŝ2 is 0.917 (Example 6) — EIS favors nulls over errors") {
    val v = Similarity.eis(Fixtures.sHat2(spark), source)
    assert(math.abs(v - 0.9166667) < 1e-6, s"got $v")
  }

  test("EIS of the source against itself is 1.0") {
    assert(math.abs(Similarity.eis(source.df, source) - 1.0) < 1e-12)
  }

  test("instance similarity of the source against itself is 1.0 when no nulls, else < 1") {
    // figure3Source has one null (Smith's Gender): classic instance
    // similarity does not credit the shared null.
    val v = Similarity.instanceSimilarity(source.df, source)
    assert(math.abs(v - (0.75 + 1.0 + 1.0) / 3) < 1e-6, s"got $v")
  }

  test("EIS of an empty reclamation is 0") {
    assert(Similarity.eis(source.df.limit(0), source) == 0.0)
  }

  test("EIS penalizes errors below omissions") {
    val err = Fixtures.stringDf(spark,
      Seq("ID", "Name", "Age", "Gender", "Education"),
      Seq(Seq("1", "Brown", "99", "Male", "Masters")))
    val omit = Fixtures.stringDf(spark,
      Seq("ID", "Name", "Age", "Gender", "Education"),
      Seq(Seq("1", "Brown", null, "Male", "Masters")))
    assert(Similarity.eis(err, source) < Similarity.eis(omit, source))
  }

  test("EIS takes the best aligned tuple per source tuple") {
    val multi = Fixtures.stringDf(spark,
      Seq("ID", "Name", "Age", "Gender", "Education"),
      Seq(
        Seq("1", "Brown", "24", "Male", "Masters"), // perfect
        Seq("1", "XXX", "YYY", "ZZZ", "WWW") // garbage, same key
      ))
    // t1 contributes (1 + 4/4); t0, t2 contribute 0.
    val v = Similarity.eis(multi, source)
    assert(math.abs(v - 0.5 * 2.0 / 3) < 1e-9, s"got $v")
  }

  test("alignment ignores reclaimed tuples whose key is absent from the source") {
    val extra = Fixtures.stringDf(spark,
      Seq("ID", "Name", "Age", "Gender", "Education"),
      Seq(Seq("7", "Nobody", "1", "X", "Y")))
    assert(Similarity.eis(extra, source) == 0.0)
  }

  test("EIS with multi-attribute keys aligns on all key columns") {
    val src = SourceTable("mk", Fixtures.stringDf(spark,
      Seq("k1", "k2", "v"),
      Seq(Seq("a", "1", "x"), Seq("a", "2", "y"))), Seq("k1", "k2"))
    val half = Fixtures.stringDf(spark,
      Seq("k1", "k2", "v"), Seq(Seq("a", "1", "x")))
    assert(math.abs(Similarity.eis(half, src) - 0.5) < 1e-9)
  }
}
