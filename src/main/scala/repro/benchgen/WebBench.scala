package repro.benchgen

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types.{StringType, StructField, StructType}
import repro.lake.{LakeIndex, SourceTable, TableRepo}

/** T2D-Gold-style web-table benchmark (paper §VI-D), container-scaled.
  *
  * A corpus of small entity tables with a key column, where — as in T2D
  * Gold — we do not know a priori whether any table is reclaimable; every
  * table is iterated as a potential source against the *other* tables.
  * The generator plants structure mirroring what the paper found:
  *   - `nReclaimable` tables whose full content is also present as 5–6
  *     fragment tables (vertical + horizontal splits) → reclaimable by a
  *     multi-table integration;
  *   - `nDuplicatePairs` exact-duplicate pairs → "duplicate tables found";
  *   - the rest are unrelated (disjoint vocabularies).
  * The WDC variant embeds the corpus among [[Distractors]] tables.
  */
object WebBench {

  final case class Benchmark(
      repo: TableRepo,
      index: DataFrame,
      sources: Seq[SourceTable],
      reclaimable: Set[String],
      duplicates: Set[String])

  private def mkTable(spark: SparkSession, cols: Seq[String],
                      rows: Seq[Seq[String]]): DataFrame = {
    val schema = StructType(cols.map(c => StructField(c, StringType, nullable = true)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(rows.map(Row.fromSeq(_)), 1), schema)
  }

  def build(spark: SparkSession, root: String,
            nTables: Int = 60, nReclaimable: Int = 3, nDuplicatePairs: Int = 6,
            distractors: Int = 0, seed: Int = 5): Benchmark = {
    val rng = new scala.util.Random(seed)
    val tables = scala.collection.mutable.LinkedHashMap[String, (Seq[String], Seq[Seq[String]])]()

    // Base entity tables: key column + 3-5 attribute columns, values from
    // a per-table vocabulary so unrelated tables share nothing.
    (0 until nTables).foreach { i =>
      val nCols = 4 + rng.nextInt(2)
      val nRows = 20 + rng.nextInt(60)
      val cols = s"t${i}_key" +: (1 until nCols).map(j => s"t${i}_a$j")
      val rows = (0 until nRows).map { r =>
        s"e${i}_$r" +: (1 until nCols).map(j => s"v${i}_${j}_${r % (5 + j)}_$r")
      }
      tables(s"web_$i") = (cols, rows)
    }

    // Fragment sets for the first nReclaimable tables: three vertical
    // slices (key + a third of the attributes each), covering every row —
    // integrating them reclaims the base exactly.
    val reclaimable = (0 until nReclaimable).map(i => s"web_$i").toSet
    reclaimable.toSeq.sorted.foreach { nm =>
      val (cols, rows) = tables(nm)
      val attrs = cols.tail
      val per = math.max(1, (attrs.size + 2) / 3)
      for ((group, vi) <- attrs.grouped(per).toSeq.zipWithIndex) {
        val vert = cols.head +: group
        val idx = vert.map(cols.indexOf)
        tables(s"${nm}_frag_$vi") = (vert, rows.map(r => idx.map(r)))
      }
    }

    // "Superset versions" of the reclaimable tables, as real web corpora
    // contain: all base rows with half the non-key cells corrupted, plus
    // extra rows with new keys. Target-agnostic integration (ALITE)
    // unions the extra rows in (lowest precision); ALITE-PS selects them
    // away but keeps the conflicting corrupted tuples; Gen-T's matrix
    // traversal starts from a clean fragment (higher simulated EIS than
    // the noisy superset) and never admits the superset.
    reclaimable.toSeq.sorted.foreach { nm =>
      val (cols, rows) = tables(nm)
      val corrupted = rows.zipWithIndex.map { case (r, ri) =>
        r.zipWithIndex.map { case (v, ci) =>
          if (ci > 0 && (ri + ci) % 2 == 0) s"ERR_$v" else v
        }
      }
      val extra = (0 until rows.size / 2).map { r =>
        s"x${nm}_$r" +: (1 until cols.size).map(j => s"xv_${nm}_${j}_$r")
      }
      tables(s"${nm}_super") = (cols, corrupted ++ extra)
    }

    // Duplicate pairs among unplanted tables.
    val dupBases = (nReclaimable until (nReclaimable + nDuplicatePairs)).map(i => s"web_$i")
    dupBases.foreach(nm => tables(s"${nm}_dup") = tables(nm))

    val repo = new TableRepo(root, spark)
    val needBuild = repo.tableNames.isEmpty
    if (needBuild) {
      tables.foreach { case (nm, (cols, rows)) => repo.write(nm, mkTable(spark, cols, rows)) }
      if (distractors > 0)
        Distractors.tables(spark, distractors, seed = seed + 1)
          .foreach { case (nm, df) => repo.write(nm, df) }
    }
    val index = LakeIndex.buildOrLoad(repo, spark).cache()

    // Every base web table is a potential source; key = its key column.
    val sources = (0 until nTables).map { i =>
      val nm = s"web_$i"
      val (cols, _) = tables(nm)
      SourceTable(nm, repo.read(nm).df, Seq(cols.head))
    }
    Benchmark(repo, index, sources,
      reclaimable, (dupBases ++ dupBases.map(_ + "_dup")).toSet)
  }
}
