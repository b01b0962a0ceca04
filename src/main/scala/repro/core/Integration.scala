package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.lake.SourceTable

/** Table Integration (paper Algorithm 2).
  *
  * Preprocess: ProjectSelect (π, σ) → InnerUnion of same-schema tables →
  * LabelSourceNulls → TakeMinimalForm (dedupe, β, κ). Integrate: fold the
  * tables with outer union, applying complementation / subsumption after
  * each step only when they do not lower the EIS against the
  * (null-labeled) source — the paper's guard against over-combining.
  * Finally remove the null labels and pad to the source schema.
  */
object Integration {

  /** Prefix of labeled-null tokens (LabelSourceNulls / RemoveLabeledNulls). */
  val NullLabelPrefix = "⟂|"

  private def keyExpr(source: SourceTable): Column =
    concat_ws("", source.keys.map(col): _*)

  /** The source with every null non-key value replaced by its
    * deterministic label token — integration-time similarity is evaluated
    * against this copy so labeled nulls in the tables count as matches.
    */
  def labeledSource(source: SourceTable): SourceTable = {
    val k = keyExpr(source)
    val cols = source.df.columns.toIndexedSeq.map { c =>
      if (source.keys.contains(c)) col(c)
      else when(col(c).isNull, concat(lit(NullLabelPrefix), k, lit("|" + c))).otherwise(col(c)).as(c)
    }
    source.copy(df = source.df.select(cols: _*))
  }

  /** LabelSourceNulls (Algorithm 2, line 5): in table `df`, wherever both
    * the table and the aligned source tuple are null in a column, replace
    * the table's null with the same label token used by [[labeledSource]]
    * — so β/κ cannot over-combine away a *correct* null.
    */
  def labelNulls(df: DataFrame, source: SourceTable): DataFrame = {
    val s = source.df
    val sA = s.select(s.columns.toIndexedSeq.map(c => col(c).as(s"s_$c")): _*)
    val joinCond = source.keys.map(k => col(k) === col(s"s_$k")).reduce(_ && _)
    val joined = df.join(sA, joinCond, "left")
    val k = concat_ws("", source.keys.map(c => col(s"s_$c")): _*)
    val cols = df.columns.toIndexedSeq.map { c =>
      if (source.keys.contains(c) || !s.columns.contains(c)) col(c)
      else when(col(c).isNull && col(s"s_$c").isNull && col(s"s_${source.keys.head}").isNotNull,
                concat(lit(NullLabelPrefix), k, lit("|" + c)))
        .otherwise(col(c)).as(c)
    }
    joined.select(cols: _*)
  }

  /** RemoveLabeledNulls (Algorithm 2, line 14). */
  def removeLabeledNulls(df: DataFrame): DataFrame =
    df.select(df.columns.toIndexedSeq.map { c =>
      when(col(c).startsWith(NullLabelPrefix), lit(null).cast("string")).otherwise(col(c)).as(c)
    }: _*)

  /** Algorithm 2 end to end. Input tables must contain the source key. */
  def integrate(tables: Seq[DataFrame], source: SourceTable): DataFrame = {
    if (tables.isEmpty) return source.df.limit(0)

    val labeled = labeledSource(source)

    // Lines 3–6: ProjectSelect, InnerUnion, LabelSourceNulls, minimal form.
    val ps = tables.map(t => Operators.projectSelect(t, source))
    val unioned = Operators.innerUnionGroups(ps)
    val prepared = unioned
      .map(t => labelNulls(t, source))
      .map(t => Operators.minimalForm(t, source.keys).cache())

    // Iterate in descending EIS order (traversal pick order is preserved
    // upstream by Gen-T; standalone callers get a deterministic order).
    val ordered = prepared
      .map(t => (t, Similarity.eis(t, labeled)))
      .sortBy(-_._2).map(_._1)

    // Lines 8–13: outer union fold with conditional κ and β.
    var result = ordered.head
    for (t <- ordered.tail) {
      var merged = Operators.outerUnion(result, t).cache()
      val base = Similarity.eis(merged, labeled)
      val comp = Operators.complementation(merged, source.keys).cache()
      if (Similarity.eis(comp, labeled) >= base) merged = comp
      val afterComp = Similarity.eis(merged, labeled)
      val sub = Operators.subsumption(merged, source.keys).cache()
      if (Similarity.eis(sub, labeled) >= afterComp) merged = sub
      result = merged
    }

    // Lines 14–16: unlabel, pad missing columns, order as the source.
    Operators.padToSourceSchema(removeLabeledNulls(result), source)
  }
}
