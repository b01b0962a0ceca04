package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.lake.SourceTable

/** The Ver baseline (Gong et al., ICDE 2023) adapted to reclamation as in
  * the paper (§VI-A1): Ver is a Query-by-Example system queried with
  * two-column examples; its goal is to return views that *contain* the
  * example tuples plus many additional tuples.
  *
  * Following the paper's protocol we query with two columns of the source
  * at a time — each (key, non-key column) pair. A view for a pair is the
  * two-column projection of any input table containing both columns, or
  * of a natural join of two input tables that together cover the pair.
  * All views of a pair are unioned (keeping every tuple, not just source
  * tuples), and the per-pair results are aggregated into a full-width
  * table by full-disjunction on the key — reproducing Ver's signature
  * high-recall / low-precision output. Inputs above `rowCap` rows time
  * out (None), as in the paper (Ver only runs with the integrating set on
  * TP-TR Small).
  */
object Ver {

  final case class Config(rowCap: Int = 20000)

  def run(
      tables: Seq[DataFrame],
      source: SourceTable,
      spark: SparkSession,
      cfg: Config = Config()): Option[DataFrame] = {
    if (tables.isEmpty || source.keys.isEmpty) return None
    val memInputs = tables.flatMap(df => MemTable.fromDf(df, cfg.rowCap))
    if (memInputs.size != tables.size) return None
    if (memInputs.map(_.rows.size).sum > cfg.rowCap) return None

    val keys = source.keys
    val nonKey = source.nonKeyColumns

    // One 2-column "example query" per (key-set, non-key column) pair.
    val perColumn: Seq[MemTable] = nonKey.flatMap { c =>
      val wanted = keys :+ c
      val direct = memInputs.filter(t => wanted.forall(t.cols.contains))
        .map(_.project(wanted))
      val joined = for {
        a <- memInputs if keys.forall(a.cols.contains) && !a.cols.contains(c)
        b <- memInputs if b.cols.contains(c) && a.cols.exists(b.cols.contains)
      } yield a.naturalJoin(b, "inner").project(wanted)
      val views = direct ++ joined
      views.reduceOption(_ outerUnion _)
    }

    if (perColumn.isEmpty) return None

    // Aggregate the two-column views into one table: full outer join on
    // the key (per-key cross-combination of the views' values).
    val combined = perColumn.reduce((a, b) => a.naturalJoin(b, "full"))
    Some(MemTable.toDf(combined.padTo(source.df.columns.toIndexedSeq), spark))
  }
}
