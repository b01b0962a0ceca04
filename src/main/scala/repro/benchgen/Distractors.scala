package repro.benchgen

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Synthetic distractor tables — our container-scaled stand-in for
  * embedding a benchmark into a large real lake (SANTOS Large, WDC).
  *
  * Deterministic in (n, seed). Most tables draw from a disjoint token
  * vocabulary ("w<t>_<v>"); a configurable fraction are *misleading*:
  * they include small-integer and date-like columns whose values collide
  * with TPC-H key/date domains, so candidate retrieval has real noise to
  * prune (the paper's motivation for diversification + matrix traversal).
  */
object Distractors {

  def tables(spark: SparkSession, n: Int, seed: Int,
             misleadingFrac: Double = 0.2): Map[String, DataFrame] = {
    (0 until n).map { i =>
      val rng = new scala.util.Random(seed * 7919 + i)
      val nCols = 3 + rng.nextInt(4)
      val nRows = 20 + rng.nextInt(180)
      val misleading = rng.nextDouble() < misleadingFrac
      val cols = (0 until nCols).map { j =>
        val base = col("id") * (j + 1) + lit(rng.nextInt(1000))
        val c =
          if (misleading && j == 0)
            (pmod(base, lit(2000)) + 1).cast("string") // collides with key domains
          else if (misleading && j == 1)
            date_add(lit("1992-01-01").cast("date"), pmod(base, lit(2500)).cast("int"))
              .cast("string") // collides with date domains
          else concat(lit(s"w${i}_"), pmod(base * 31 + lit(rng.nextInt(97)), lit(5000)).cast("string"))
        c.as(s"d${i}_c$j")
      }
      s"distractor_$i" -> spark.range(nRows).select(cols: _*)
    }.toMap
  }
}
