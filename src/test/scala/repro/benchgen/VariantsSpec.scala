package repro.benchgen

import repro.{Fixtures, SparkSpec}
import org.apache.spark.sql.functions._

/** Noise injection for TP-TR lake versions. */
class VariantsSpec extends SparkSpec {

  private lazy val base = repro.lake.Lake.stringify(
    repro.SynthData.customer(spark, sf = 0.001)) // 150 rows

  test("nullified replaces ~p of cells with nulls") {
    val v = Variants.nullified(base, 0.5, high = false, seed = 1)
    val cells = (base.count() * base.columns.length).toDouble
    val nulls = v.select(base.columns.map(c =>
      sum(col(c).isNull.cast("long")).as(c)).toIndexedSeq: _*)
      .collect()(0).toSeq.map(_.asInstanceOf[Long]).sum.toDouble
    assert(math.abs(nulls / cells - 0.5) < 0.08, s"null frac ${nulls / cells}")
  }

  test("nullified low/high masks at p=0.5 are complementary") {
    // Each cell is nulled in exactly one of the two versions, so the two
    // versions' null counts partition the cell grid — the property that
    // makes perfect reclamation via complementation possible.
    val lo = Variants.nullified(base, 0.5, high = false, seed = 1).collect().map(_.toSeq)
    val hi = Variants.nullified(base, 0.5, high = true, seed = 1).collect().map(_.toSeq)
    val total = lo.length * base.columns.length
    val lNulls = lo.flatten.count(_ == null)
    val hNulls = hi.flatten.count(_ == null)
    assert(lNulls + hNulls == total,
      s"masks not complementary: $lNulls + $hNulls != $total")
    assert(lNulls > 0 && hNulls > 0)
  }

  test("erroneous replaces cells with fresh E#-prefixed strings") {
    val v = Variants.erroneous(base, 0.5, high = false, seed = 2)
    val errCells = v.collect().flatMap(_.toSeq).count {
      case s: String => s.startsWith("E#")
      case _ => false
    }
    assert(errCells > 0)
    val cells = (base.count() * base.columns.length).toDouble
    assert(math.abs(errCells / cells - 0.5) < 0.08)
  }

  test("variants are deterministic in seed") {
    val a = Variants.nullified(base, 0.5, high = false, seed = 1).collect().toSet
    val b = Variants.nullified(base, 0.5, high = false, seed = 1).collect().toSet
    assert(a == b)
  }

  test("different seeds give different masks") {
    val a = Variants.erroneous(base, 0.5, high = false, seed = 2).collect().toSet
    val b = Variants.erroneous(base, 0.5, high = false, seed = 99).collect().toSet
    assert(a != b)
  }

  test("fourVersions produces the four named lake tables") {
    val vs = Variants.fourVersions("t", base)
    assert(vs.keySet == Set("t_n1", "t_n2", "t_e1", "t_e2"))
  }

  test("p > 0.5 makes the two nullified masks overlap (ablation axis)") {
    val lo = Variants.nullified(base, 0.8, high = false, seed = 1).collect().map(_.toSeq)
    val hi = Variants.nullified(base, 0.8, high = true, seed = 1).collect().map(_.toSeq)
    val total = (base.count() * base.columns.length).toDouble
    val nullFrac = (lo.flatten.count(_ == null) + hi.flatten.count(_ == null)) / (2 * total)
    assert(nullFrac > 0.7) // both sides ~80% null → unreclaimable cells exist
  }
}
