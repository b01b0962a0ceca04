package repro.benchgen

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Cell-level noise injection for benchmark lake tables (paper §VI-A).
  *
  * Every TP-TR lake table comes in four versions of the original: two
  * *nullified* versions (cells replaced with nulls) and two *erroneous*
  * versions (cells replaced with fresh non-null strings). Masks are
  * deterministic per cell: hash(row-identity, column, seed) mapped to
  * [0, 1).
  *
  * Noise never touches the base table's primary-key cells (`protect`).
  * The paper's construction is underspecified here, but its headline
  * result pins it down: perfect reclamation of most single-table sources
  * is only possible if (a) every tuple of a nullified version remains
  * alignable — its key cells survive — and (b) the two nullified
  * versions' masks are complementary so complementation across them
  * rebuilds every original tuple. We therefore nullify non-key cells
  * with version A masking h < p and version B masking h ≥ 1 − p: exactly
  * complementary at the default p = 0.5, overlapping (unreclaimable
  * cells) for p > 0.5 — the axis the paper's Figure 7 ablation tunes.
  * Non-key join columns (e.g. o_custkey) are still nullified, which is
  * what degrades join-query reclamation exactly as in the paper.
  */
object Variants {

  /** h(row, column, seed) ∈ [0, 1), deterministic in the original row. */
  private def cellHash(df: DataFrame, c: String, seed: Int): Column = {
    val rowId = concat_ws("", df.columns.toIndexedSeq.map(col): _*)
    pmod(xxhash64(rowId, lit(c), lit(seed)), lit(1000000L)).cast("double") / 1000000.0
  }

  private def mask(df: DataFrame, c: String, seed: Int, p: Double, high: Boolean): Column = {
    val h = cellHash(df, c, seed)
    if (high) h >= lit(1.0 - p) else h < lit(p)
  }

  /** Replace masked non-key cells with null. */
  def nullified(df: DataFrame, p: Double, high: Boolean, seed: Int,
                protect: Seq[String] = Seq.empty): DataFrame =
    df.select(df.columns.toIndexedSeq.map { c =>
      if (protect.contains(c)) col(c).cast("string").as(c)
      else when(mask(df, c, seed, p, high), lit(null).cast("string"))
        .otherwise(col(c).cast("string")).as(c)
    }: _*)

  /** Replace masked non-key cells with fresh non-null strings ("E#<hash>"). */
  def erroneous(df: DataFrame, p: Double, high: Boolean, seed: Int,
                protect: Seq[String] = Seq.empty): DataFrame =
    df.select(df.columns.toIndexedSeq.map { c =>
      if (protect.contains(c)) col(c).cast("string").as(c)
      else when(mask(df, c, seed, p, high),
           concat(lit("E#"), pmod(xxhash64(col(c).cast("string"), lit(c), lit(seed + 77)),
                                  lit(100000000L)).cast("string")))
        .otherwise(col(c).cast("string")).as(c)
    }: _*)

  /** The four standard versions of one original table. */
  def fourVersions(name: String, df: DataFrame, protect: Seq[String] = Seq.empty,
                   nullP: Double = 0.5, errP: Double = 0.5): Map[String, DataFrame] = Map(
    s"${name}_n1" -> nullified(df, nullP, high = false, seed = 11, protect),
    s"${name}_n2" -> nullified(df, nullP, high = true, seed = 11, protect),
    s"${name}_e1" -> erroneous(df, errP, high = false, seed = 23, protect),
    s"${name}_e2" -> erroneous(df, errP, high = true, seed = 29, protect),
  )
}
