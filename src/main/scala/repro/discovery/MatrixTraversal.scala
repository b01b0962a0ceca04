package repro.discovery

import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.Operators
import repro.lake.SourceTable

/** Matrix Traversal (paper §V-A2/V-A3, Algorithm 1).
  *
  * Each candidate table is represented as a three-valued alignment matrix
  * against the source: per aligned tuple and non-key column the code is
  *   -  1  if the candidate shares the source's value (null-safe),
  *   -  0  if the source is non-null and the candidate is null,
  *   - −1  otherwise (contradicting non-null, or non-null where the
  *          source is null) — Eq. (4).
  *
  * Matrix initialization is one distributed job: all candidates are
  * padded to the source schema, tagged, outer-unioned, joined with the
  * source on the key, coded with `when` expressions, capped per
  * (table, key) by a window, and collected (a matrix is at most
  * |S| × |non-key cols| × cap — tiny). The greedy traversal itself runs
  * on the driver, exactly as Algorithm 1: start from the best single
  * matrix and keep adding the table whose Combine() raises the simulated
  * EIS, stopping at convergence.
  *
  * Combine() keeps two aligned tuples separate when they carry a 1 and a
  * −1 at the same position (outer union keeps contradicting tuples
  * apart); otherwise it merges element-wise with "non-zero wins over 0"
  * — the table semantics the matrix simulates (a κ-filled null takes the
  * filler's correctness), see DESIGN.md §3.
  */
object MatrixTraversal {

  type CodeRow = Vector[Int]

  /** Alignment matrix: source-key string → aligned code rows. */
  final case class Matrix(rows: Map[String, Seq[CodeRow]])

  final case class Config(rowsPerKeyCap: Int = 20, rowsPerKeyCombinedCap: Int = 40)

  private val KeySep = ""

  /** Initialize every candidate's matrix in one distributed pass. */
  def initMatrices(
      tables: Seq[Expand.Expanded],
      source: SourceTable,
      cfg: Config = Config()): Map[String, Matrix] = {
    if (tables.isEmpty) return Map.empty
    val nk = source.nonKeyColumns
    val tagged = tables.map { t =>
      Operators.padToSourceSchema(t.df, source).withColumn("__tbl", lit(t.name))
    }
    val all = Operators.outerUnionAll(tagged)
    val rA = all.select(
      (all.columns.toIndexedSeq.filterNot(_ == "__tbl").map(c => col(c).as(s"r_$c")) :+
        col("__tbl")): _*)
    val joinCond = source.keys.map(k => col(k) === col(s"r_$k")).reduce(_ && _)
    val joined = source.df.join(rA, joinCond, "inner")

    val codes = nk.map { c =>
      when(col(c) <=> col(s"r_$c"), 1)
        .when(col(c).isNotNull && col(s"r_$c").isNull, 0)
        .otherwise(-1).as(s"code_$c")
    }
    val keyStr = concat_ws(KeySep, source.keys.map(col): _*).as("__key")
    val scoreCols = nk.map(c => when(col(s"code_$c") === 1, 1).otherwise(0))
    val coded = joined.select((Seq(col("__tbl"), keyStr) ++ codes): _*)
      .withColumn("__alpha",
        if (nk.isEmpty) lit(0) else scoreCols.reduce(_ + _))
    val capped = coded
      .withColumn("__rn", row_number().over(
        Window.partitionBy("__tbl", "__key").orderBy(col("__alpha").desc)))
      .where(col("__rn") <= cfg.rowsPerKeyCap)

    val collected = capped.collect()
    val byTable = collected.groupBy(_.getString(0))
    tables.map { t =>
      val rows = byTable.getOrElse(t.name, Array.empty).toIndexedSeq
      val m = rows.groupBy(_.getString(1)).map { case (k, rs) =>
        k -> rs.map(r => nk.indices.map(i => r.getInt(2 + i)).toVector).distinct
      }
      t.name -> Matrix(m)
    }.toMap
  }

  private def conflict(a: CodeRow, b: CodeRow): Boolean =
    a.indices.exists(i => (a(i) == 1 && b(i) == -1) || (a(i) == -1 && b(i) == 1))

  private def mergeCodes(a: CodeRow, b: CodeRow): CodeRow =
    a.indices.map(i => if (a(i) != 0) a(i) else b(i)).toVector

  private[discovery] def rowScore(r: CodeRow): Int =
    r.count(_ == 1) - r.count(_ == -1)

  /** Combine the aligned rows of one key: merge compatible pairs to a
    * fixpoint, keep {1,−1} conflicts separate.
    */
  private[discovery] def combineRows(
      l1: Seq[CodeRow], l2: Seq[CodeRow], cap: Int): Seq[CodeRow] = {
    val cur = (l1 ++ l2).distinct.toBuffer
    var changed = true
    while (changed) {
      changed = false
      var i = 0
      while (i < cur.length && !changed) {
        var j = i + 1
        while (j < cur.length && !changed) {
          if (!conflict(cur(i), cur(j))) {
            val m = mergeCodes(cur(i), cur(j))
            if (m != cur(i) || m != cur(j)) {
              cur.remove(j); cur.remove(i)
              if (!cur.contains(m)) cur.append(m)
              changed = true
            }
          }
          j += 1
        }
        i += 1
      }
    }
    cur.sortBy(r => -rowScore(r)).take(cap).toSeq
  }

  def combine(a: Matrix, b: Matrix, cfg: Config = Config()): Matrix = {
    val keys = a.rows.keySet ++ b.rows.keySet
    Matrix(keys.iterator.map { k =>
      (a.rows.get(k), b.rows.get(k)) match {
        case (Some(x), Some(y)) => k -> combineRows(x, y, cfg.rowsPerKeyCombinedCap)
        case (Some(x), None)    => k -> x
        case (None, Some(y))    => k -> y
        case _                  => k -> Seq.empty
      }
    }.toMap)
  }

  /** Simulated EIS of a matrix (evaluateSimilarity of Algorithm 1):
    * per source tuple the best aligned row's (α−δ); missing keys add 0.
    */
  def evaluate(m: Matrix, nSourceRows: Long, nNonKey: Int): Double = {
    if (nSourceRows == 0) return 1.0
    val n = math.max(1, nNonKey)
    val sum = m.rows.valuesIterator.map { rs =>
      if (rs.isEmpty) 0.0 else 1.0 + rs.map(rowScore).max.toDouble / n
    }.sum
    0.5 * sum / nSourceRows
  }

  /** Algorithm 1: greedy matrix traversal → originating table names (in
    * pick order). Strict improvement required to continue.
    */
  def traverse(
      matrices: Map[String, Matrix],
      nSourceRows: Long,
      nNonKey: Int,
      cfg: Config = Config()): Seq[String] = {
    if (matrices.isEmpty) return Seq.empty
    val eps = 1e-12
    val start = matrices.maxBy { case (n, m) => (evaluate(m, nSourceRows, nNonKey), n) }
    var orig = Vector(start._1)
    var current = start._2
    var best = evaluate(current, nSourceRows, nNonKey)
    var improved = true
    while (improved && orig.size < matrices.size) {
      improved = false
      val candidates = matrices.view.filterKeys(k => !orig.contains(k)).toMap
      if (candidates.nonEmpty) {
        val scored = candidates.map { case (name, m) =>
          val c = combine(current, m, cfg)
          (name, c, evaluate(c, nSourceRows, nNonKey))
        }
        val (bn, bm, bs) = scored.maxBy { case (n, _, s) => (s, n) }
        if (bs > best + eps) {
          orig :+= bn; current = bm; best = bs; improved = true
        }
      }
    }
    orig
  }
}
