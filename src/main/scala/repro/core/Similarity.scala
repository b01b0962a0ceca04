package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.lake.SourceTable

/** Error-aware instance similarity (paper §IV-A, Definitions 4–5).
  *
  * Tuples of a candidate/reclaimed table are aligned to source tuples by
  * equality on the source key. For an aligned pair (s, t) over the n
  * non-key attributes:
  *   - α(s,t) = #attributes where s and t agree (null-safe: both-null
  *     counts as agreement, per the paper's Example 6),
  *   - δ(s,t) = #attributes where t is non-null and differs from s.
  *
  * Error-aware tuple similarity E = (α − δ)/n; EIS over the instance is
  * `0.5·Σ_s max_t(1+E(s,t)) / |S|`, where a source tuple with no aligned
  * tuple contributes 0. Instance similarity (Alexe et al.) uses α/n.
  */
object Similarity {

  /** Per-source-key alignment aggregates: `bestScore` = max(α−δ),
    * `bestAlpha` = max α, over the reclaimed tuples sharing the key.
    * Only keys present in both tables appear.
    */
  def alignmentStats(reclaimed: DataFrame, source: SourceTable): DataFrame = {
    val nk = source.nonKeyColumns
    val r = Operators.padToSourceSchema(reclaimed, source)
    val s = source.df

    val rA = r.select(r.columns.map(c => col(c).as(s"r_$c")).toIndexedSeq: _*)
    val joinCond = source.keys.map(k => col(k) === col(s"r_$k")).reduce(_ && _)
    val joined = s.join(rA, joinCond, "inner")

    // EIS counts a shared null as agreement (paper Example 6: Ŝ2's t0
    // scores 3/4); classic instance similarity counts only shared
    // *non-null* values (same example: t0 scores 2/4).
    def matchesEis(c: String): Column = (col(c) <=> col(s"r_$c")).cast("int")
    def matchesInst(c: String): Column =
      ((col(c) <=> col(s"r_$c")) && col(c).isNotNull).cast("int")
    def errs(c: String): Column =
      (col(s"r_$c").isNotNull && !(col(c) <=> col(s"r_$c"))).cast("int")

    val alphaEis =
      if (nk.isEmpty) lit(0) else nk.map(matchesEis).reduce(_ + _)
    val alphaInst =
      if (nk.isEmpty) lit(0) else nk.map(matchesInst).reduce(_ + _)
    val delta =
      if (nk.isEmpty) lit(0) else nk.map(errs).reduce(_ + _)

    joined
      .select((source.keys.map(col) :+ alphaEis.as("alphaEis") :+
        alphaInst.as("alphaInst") :+ delta.as("delta")): _*)
      .groupBy(source.keys.map(col): _*)
      .agg(max(col("alphaEis") - col("delta")).as("bestScore"),
           max(col("alphaInst")).as("bestAlpha"))
  }

  private def sourceSize(source: SourceTable): Long = source.df.count()

  /** EIS of Definition 5 / Eq. (3), in [0, 1]. */
  def eis(reclaimed: DataFrame, source: SourceTable): Double = {
    val n = math.max(1, source.nonKeyColumns.size)
    val total = sourceSize(source)
    if (total == 0) return 1.0
    val stats = alignmentStats(reclaimed, source)
      .agg(sum(lit(1.0) + col("bestScore").cast("double") / n).as("s"))
      .collect()(0)
    val sumTerm = if (stats.isNullAt(0)) 0.0 else stats.getDouble(0)
    0.5 * sumTerm / total
  }

  /** Instance similarity of Definition 5 / Eq. (2), in [0, 1]. */
  def instanceSimilarity(reclaimed: DataFrame, source: SourceTable): Double = {
    val n = math.max(1, source.nonKeyColumns.size)
    val total = sourceSize(source)
    if (total == 0) return 1.0
    val stats = alignmentStats(reclaimed, source)
      .agg(sum(col("bestAlpha").cast("double") / n).as("s"))
      .collect()(0)
    val sumTerm = if (stats.isNullAt(0)) 0.0 else stats.getDouble(0)
    sumTerm / total
  }
}
