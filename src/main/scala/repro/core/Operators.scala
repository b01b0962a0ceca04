package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.lake.SourceTable

/** The paper's integration operators (§IV-B): Outer Union (⊎), Inner
  * Union (∪), Projection (π), Selection (σ), Subsumption (β), and
  * Complementation (κ).
  *
  * β and κ are pairwise tuple operators. Two tuples can only subsume or
  * complement each other if they agree on every attribute where both are
  * non-null — so once every tuple carries a non-null source-key value
  * (guaranteed after ProjectSelect/Expand), grouping by the key is exact
  * and turns the quadratic pairwise scan into small per-key closures run
  * inside `groupByKey.flatMapGroups`. The generic (key-free) variants
  * needed by the ALITE baseline live in [[Fd]].
  */
object Operators {

  /** Outer Union (⊎): union by column name; columns missing on one side
    * are padded with nulls. Commutative and associative.
    */
  def outerUnion(a: DataFrame, b: DataFrame): DataFrame =
    a.unionByName(b, allowMissingColumns = true)

  def outerUnionAll(dfs: Seq[DataFrame]): DataFrame = {
    require(dfs.nonEmpty, "outerUnionAll of zero tables")
    dfs.reduce(outerUnion)
  }

  /** Project `df` onto the columns of the source it actually has,
    * in source order (π of Algorithm 2's ProjectSelect).
    */
  def projectToSource(df: DataFrame, source: SourceTable): DataFrame = {
    val keep = source.df.columns.filter(df.columns.contains).toIndexedSeq
    df.select(keep.map(col): _*)
  }

  /** Select tuples whose key value appears among the source's key values
    * (σ of Algorithm 2's ProjectSelect) — a distributed semi-join.
    * Tables missing some key column are returned unchanged (they are
    * expected to have been expanded first; ALITE-PS also uses this and
    * simply keeps such tables whole).
    */
  def selectSourceKeys(df: DataFrame, source: SourceTable): DataFrame =
    if (!source.keys.forall(df.columns.contains)) df
    else {
      val sk = source.df.select(source.keys.map(col): _*).distinct()
      df.join(sk, source.keys, "left_semi")
    }

  /** ProjectSelect of Algorithm 2, line 3. */
  def projectSelect(df: DataFrame, source: SourceTable): DataFrame =
    selectSourceKeys(projectToSource(df, source), source)

  /** InnerUnion of Algorithm 2, line 4: union tables that share the same
    * column set (same schema ⇒ outer union = inner union, Lemma 11).
    */
  def innerUnionGroups(dfs: Seq[DataFrame]): Seq[DataFrame] =
    dfs.groupBy(_.columns.toSet).values.toSeq
      .map(group => group.reduce((a, b) => a.unionByName(b)))

  // ---------------------------------------------------------------------
  // Pairwise tuple predicates over rows represented as Seq[String]
  // (null = ⊥). Shared by the key-grouped operators here and the generic
  // full-disjunction closure in Fd.
  // ---------------------------------------------------------------------

  /** a subsumes b: wherever b is non-null they agree, and a is non-null
    * somewhere b is null.
    */
  private[core] def subsumes(a: Seq[String], b: Seq[String]): Boolean = {
    var strict = false
    var i = 0
    while (i < a.length) {
      val x = a(i); val y = b(i)
      if (y != null && x != y) return false
      if (y == null && x != null) strict = true
      i += 1
    }
    strict
  }

  /** a and b complement: agree on all both-non-null attributes, share at
    * least one non-null value, and each has a non-null where the other
    * has a null.
    */
  private[core] def complement(a: Seq[String], b: Seq[String]): Boolean = {
    var share = false; var aOnly = false; var bOnly = false
    var i = 0
    while (i < a.length) {
      val x = a(i); val y = b(i)
      if (x != null && y != null) { if (x != y) return false; share = true }
      else if (x != null) aOnly = true
      else if (y != null) bOnly = true
      i += 1
    }
    share && aOnly && bOnly
  }

  private[core] def merge(a: Seq[String], b: Seq[String]): Seq[String] =
    a.indices.map(i => if (a(i) != null) a(i) else b(i))

  /** Remove duplicates and subsumed tuples from a small in-memory group. */
  private[core] def subsumeGroup(rows: Seq[Seq[String]]): Seq[Seq[String]] = {
    val distinct = rows.distinct
    distinct.filterNot(r => distinct.exists(r2 => !(r2 eq r) && r2 != r && subsumes(r2, r)))
  }

  /** Apply κ within a small in-memory group: repeatedly replace a
    * complementing pair with its merge until none remain.
    */
  private[core] def complementGroup(rows: Seq[Seq[String]]): Seq[Seq[String]] = {
    var cur = rows.distinct.toBuffer
    var changed = true
    while (changed) {
      changed = false
      var i = 0
      while (i < cur.length && !changed) {
        var j = i + 1
        while (j < cur.length && !changed) {
          if (complement(cur(i), cur(j))) {
            val m = merge(cur(i), cur(j))
            cur.remove(j); cur.remove(i)
            if (!cur.contains(m)) cur.append(m)
            changed = true
          }
          j += 1
        }
        i += 1
      }
    }
    cur.toSeq
  }

  // ---------------------------------------------------------------------
  // Key-grouped distributed operators
  // ---------------------------------------------------------------------

  /** Run `f` over the rows of each source-key group of `df`. Rows with a
    * null in any key column pass through untouched (they cannot be
    * grouped; in the Gen-T pipeline they do not occur post-ProjectSelect).
    */
  private def perKeyGroup(df: DataFrame, keys: Seq[String])(
      f: Seq[Seq[String]] => Seq[Seq[String]]): DataFrame = {
    val sp = df.sparkSession
    import sp.implicits._
    val cols = df.columns.toIndexedSeq
    val keyIdx = keys.map(cols.indexOf).toIndexedSeq
    require(keyIdx.forall(_ >= 0), s"keys $keys missing from ${cols}")

    val keyed = df.filter(keys.map(col(_).isNotNull).reduce(_ && _))
    val unkeyed = df.filter(keys.map(col(_).isNull).reduce(_ || _))

    val ds = keyed.map { r =>
      cols.indices.map(i => Option(r.get(i)).map(_.toString).orNull): Seq[String]
    }
    val out = ds
      .groupByKey(row => keyIdx.map(row).mkString("\u0001"))
      .flatMapGroups((_, it) => f(it.toSeq).iterator)
      .toDF("r")
    val rebuilt = out.select(cols.zipWithIndex.map { case (c, i) =>
      element_at(col("r"), i + 1).as(c)
    }: _*)
    if (unkeyed.isEmpty) rebuilt else rebuilt.unionByName(unkeyed)
  }

  /** Subsumption (β): drop duplicate and subsumed tuples, per key group. */
  def subsumption(df: DataFrame, keys: Seq[String]): DataFrame =
    perKeyGroup(df, keys)(subsumeGroup)

  /** Complementation (κ): fixpoint pairwise complementation per key group. */
  def complementation(df: DataFrame, keys: Seq[String]): DataFrame =
    perKeyGroup(df, keys)(complementGroup)

  /** TakeMinimalForm of Algorithm 2, line 6: dedupe + β + κ in one grouped
    * pass (the paper's "remove duplicate tuples, subsumed tuples (β), and
    * take the resulting tuples of complementation (κ)").
    */
  def minimalForm(df: DataFrame, keys: Seq[String]): DataFrame =
    perKeyGroup(df, keys)(rows => subsumeGroup(complementGroup(subsumeGroup(rows))))

  /** Pad `df` with null columns for every source column it lacks, then
    * order columns as in the source (Algorithm 2, lines 15–16).
    */
  def padToSourceSchema(df: DataFrame, source: SourceTable): DataFrame = {
    val cols: Seq[Column] = source.df.columns.toIndexedSeq.map { c =>
      if (df.columns.contains(c)) col(c) else lit(null).cast("string").as(c)
    }
    df.select(cols: _*)
  }
}
