package repro.baselines

import org.apache.spark.sql.DataFrame
import repro.core.{Fd, Operators}
import repro.lake.SourceTable

/** The ALITE baseline (Khatiwada et al., VLDB 2022): integrate all input
  * tables with Full Disjunction. ALITE is target-agnostic — it never
  * looks at the source table during integration.
  *
  * ALITE-PS is the paper's variant that first applies projection and
  * selection against the source (like Gen-T's ProjectSelect) before the
  * full disjunction; plain ALITE integrates the tables whole.
  *
  * Both return None when the FD closure exceeds its caps — the paper's
  * timeout behaviour (plain ALITE times out on TP-TR Large).
  */
object Alite {

  final case class Config(fd: Fd.Config = Fd.Config())

  /** Plain ALITE: FD over the candidate tables as-is. */
  def run(tables: Seq[DataFrame], cfg: Config = Config()): Option[DataFrame] =
    if (tables.isEmpty) None
    else Fd.fullDisjunction(tables, cfg.fd)

  /** ALITE-PS: project each table to the source's columns and select
    * tuples matching the source keys first, then FD.
    */
  def runPs(tables: Seq[DataFrame], source: SourceTable,
            cfg: Config = Config()): Option[DataFrame] =
    if (tables.isEmpty) None
    else Fd.fullDisjunction(tables.map(t => Operators.projectSelect(t, source)), cfg.fd)
}
