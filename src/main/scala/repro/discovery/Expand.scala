package repro.discovery

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.lake.SourceTable

/** Expand (paper Algorithm 5, Appendix C).
  *
  * Candidates that do not contain the source key column(s) cannot align
  * their tuples to the source. For each such candidate we search the join
  * graph — nodes are candidates, an edge connects two candidates sharing
  * a (renamed) column, weighted by the estimated join usefulness of that
  * column — for the maximum-weight path (DFS, as in the paper) ending at
  * a candidate that does contain the key, and materialize the joins along
  * the path as distributed natural equi-joins.
  */
object Expand {

  /** A candidate after expansion: `df` is guaranteed to contain every
    * source key column; `parts` records which candidate tables were
    * joined to build it (== Seq(name) when no join was needed).
    */
  final case class Expanded(name: String, df: DataFrame, parts: Seq[String])

  /** Natural equi-join on one chosen column; other columns appearing on
    * both sides are merged with coalesce (left wins on conflict). Joining
    * on every shared column would be too strict for lake tables: a null
    * on either side of a secondary shared column must not drop the row.
    */
  def joinCoalesce(l: DataFrame, r: DataFrame, on: String): DataFrame = {
    val dup = l.columns.toIndexedSeq.intersect(r.columns.toIndexedSeq).filterNot(_ == on)
    val rRen = dup.foldLeft(r)((d, c) => d.withColumnRenamed(c, s"__r_$c"))
    val joined = l.join(rRen, Seq(on), "inner")
    val outCols = l.columns.toIndexedSeq.map { c =>
      if (dup.contains(c)) coalesce(col(c), col(s"__r_$c")).as(c) else col(c)
    } ++ r.columns.toIndexedSeq.filterNot(c => c == on || dup.contains(c)).map(col)
    joined.select(outCols: _*)
  }

  /** Expand every candidate so each output table contains the key.
    *
    * @param tables      renamed candidate tables (name → DataFrame whose
    *                    columns are already source column names)
    * @param source      the source table (keys are source column names)
    * @param weights     per-pair per-shared-column join weights
    *                    ((tableA, tableB) → column → weight); the edge
    *                    weight is the best single join column's weight and
    *                    the join is performed on that column
    * @return expanded candidates; candidates for which no join path to a
    *         keyed table exists are dropped (they cannot align).
    */
  def expandAll(
      tables: Seq[(String, DataFrame)],
      source: SourceTable,
      weights: Map[(String, String), Map[String, Double]],
      maxPaths: Int = 2): Seq[Expanded] = {

    val hasKey: Map[String, Boolean] =
      tables.map { case (n, df) => n -> source.keys.forall(df.columns.contains) }.toMap
    val byName = tables.toMap
    val names = tables.map(_._1)

    def colWeights(a: String, b: String): Map[String, Double] =
      weights.getOrElse((a, b), weights.getOrElse((b, a), Map.empty))
        .filter { case (c, w) =>
          w > 0 && byName(a).columns.contains(c) && byName(b).columns.contains(c)
        }

    def neighbours(n: String): Seq[(String, Double)] =
      names.filter(_ != n).flatMap { m =>
        val cw = colWeights(n, m)
        if (cw.isEmpty) None else Some(m -> cw.values.max)
      }

    // DFS max-weight paths from `start` (keyless) to keyed nodes, as in
    // Algorithm 5 (node_weights / descendant bookkeeping). Returns the
    // best path to each of the top `maxPaths` end nodes: a single path
    // would tie the candidate to one (possibly incomplete) keyed table,
    // while alternative keyed versions can cover the tuples it misses.
    def bestPaths(start: String): Seq[Seq[String]] = {
      val nodeWeights = scala.collection.mutable.Map[String, Double](start -> 0.0)
      val parent = scala.collection.mutable.Map[String, String]()
      val visited = scala.collection.mutable.Set[String](start)
      val ends = scala.collection.mutable.Map[String, Double]()
      val stack = scala.collection.mutable.Stack[String](start)
      while (stack.nonEmpty) {
        val node = stack.pop()
        for ((child, w) <- neighbours(node) if !visited.contains(child)) {
          val cw = nodeWeights(node) + w
          if (cw > nodeWeights.getOrElse(child, Double.NegativeInfinity)) {
            nodeWeights(child) = cw
            parent(child) = node
          }
          if (hasKey(child)) {
            // A keyed node ends the path — joining further tables past the
            // key only adds noise (and with positive weights the "max
            // weight" search would otherwise always prefer longer chains).
            ends(child) = math.max(ends.getOrElse(child, 0.0), cw)
            visited += child
          } else {
            stack.push(child)
            visited += child
          }
        }
      }
      ends.toSeq.sortBy { case (e, w) => (-w, e) }.take(maxPaths).map { case (end, _) =>
        val path = scala.collection.mutable.ListBuffer[String](end)
        var cur = end
        while (parent.contains(cur)) { cur = parent(cur); path.prepend(cur) }
        path.toSeq
      }
    }

    names.flatMap { n =>
      if (hasKey(n)) Seq(Expanded(n, byName(n), Seq(n)))
      else bestPaths(n).map { path =>
        val joined = path.zip(path.tail).foldLeft(byName(path.head)) {
          case (acc, (prev, next)) =>
            val joinCol = colWeights(prev, next).maxBy(_._2)._1
            joinCoalesce(acc, byName(next), joinCol)
        }
        Expanded(path.mkString("+"), joined, path)
      }
    }.distinct
  }
}
