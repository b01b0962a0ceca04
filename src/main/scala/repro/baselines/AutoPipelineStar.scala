package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.lake.SourceTable

/** Auto-Pipeline* — the paper's re-implementation of Auto-Pipeline's
  * query-search variant (by-target synthesis), restricted to the
  * operator set Gen-T considers: {σ, π, ∪, ⋈, ⟕, ⟗}.
  *
  * Beam search over pipeline states: a state is an intermediate table
  * built from the inputs; expansions join (inner/left/full, natural on
  * shared columns) or outer-union the state with an input table, or apply
  * the target-driven σ/π (restrict to source columns / source key
  * values). States are scored by in-memory EIS against the target.
  * Inputs larger than `rowCap` rows in total return None — the paper's
  * timeout on every benchmark but TP-TR Small.
  */
object AutoPipelineStar {

  final case class Config(
      beamWidth: Int = 3,
      maxDepth: Int = 4,
      rowCap: Int = 20000,
      maxExpansions: Int = 400)

  private final case class State(t: MemTable, ops: List[String], score: Double)

  def run(
      tables: Seq[DataFrame],
      source: SourceTable,
      spark: SparkSession,
      cfg: Config = Config()): Option[DataFrame] = {
    if (tables.isEmpty) return None

    val memInputsOpt = tables.foldLeft(Option(Vector.empty[MemTable])) { (acc, df) =>
      acc.flatMap(v => MemTable.fromDf(df, cfg.rowCap).map(v :+ _))
    }
    val memInputs = memInputsOpt.getOrElse(return None)
    if (memInputs.map(_.rows.size).sum > cfg.rowCap) return None
    val src = MemTable.fromDf(source.df, cfg.rowCap).getOrElse(return None)
    val keyIdx = source.keys.map(src.cols.indexOf).toVector
    val srcKeys: Set[Vector[String]] = src.rows.map(r => keyIdx.map(r)).toSet

    def score(t: MemTable): Double = MemTable.eis(t, src, source.keys)

    def expansions(s: State): Seq[State] = {
      val joins = for {
        (in, i) <- memInputs.zipWithIndex
        how <- Seq("inner", "left", "full")
        if s.t.cols.exists(in.cols.contains)
      } yield {
        val t = s.t.naturalJoin(in, how)
        State(t, s"$how-join(#$i)" :: s.ops, score(t))
      }
      val unions = memInputs.zipWithIndex.collect {
        case (in, i) if in.cols.exists(s.t.cols.contains) =>
          val t = s.t.outerUnion(in)
          State(t, s"union(#$i)" :: s.ops, score(t))
      }
      val sigmaPi = {
        val t = s.t.project(src.cols).selectKeys(source.keys, srcKeys)
        Seq(State(t, "select-project" :: s.ops, score(t)))
      }
      joins ++ unions ++ sigmaPi
    }

    var beam: Vector[State] = memInputs.map(t => State(t, Nil, score(t))).toVector
      .sortBy(-_.score).take(cfg.beamWidth)
    var best = beam.head
    var depth = 0
    var expanded = 0
    while (depth < cfg.maxDepth && best.score < 1.0 - 1e-12 && expanded < cfg.maxExpansions) {
      val next = beam.flatMap { s =>
        val ex = expansions(s)
        expanded += ex.size
        ex
      }
      val pool = (beam ++ next).sortBy(-_.score)
      beam = pool.take(cfg.beamWidth)
      if (beam.head.score > best.score) best = beam.head
      depth += 1
    }

    Some(MemTable.toDf(best.t.padTo(source.df.columns.toIndexedSeq), spark))
  }
}
