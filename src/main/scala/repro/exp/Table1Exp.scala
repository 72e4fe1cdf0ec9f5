package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core.ExactEntropy

/** Table 1: runtimes (seconds) for computing *exact* entropy values with and
  * without the §3.1 optimizations, on the first `i` rows of the satellites
  * data. Runs that exceed the time budget are reported as "–" (the paper
  * aborted after 24 h; the budget here is configurable and defaults to
  * 120 s).
  */
object Table1Exp {

  /** One measured row of Table 1. `None` = aborted ("–"). */
  final case class Row(nRows: Int, optimizedS: Option[Double], unoptimizedS: Option[Double])

  def run(spark: SparkSession, maxRows: Int = 6, budgetMs: Long = 120000L): Seq[Row] = {
    (1 to maxRows).map { i =>
      val prep = Experiments.satellitesPrefix(spark, i)
      val opt = ExactEntropy.optimized(prep.inst, prep.fds, budgetMs)
      val unopt = ExactEntropy.naive(prep.inst, prep.fds, budgetMs)
      Row(
        i,
        if (opt.aborted) None else Some(opt.elapsedMs / 1000.0),
        if (unopt.aborted) None else Some(unopt.elapsedMs / 1000.0),
      )
    }
  }

  def format(rows: Seq[Row]): String = {
    def cell(v: Option[Double]) = v.map(s => f"$s%.3f").getOrElse("-")
    Experiments.formatTable(
      Seq("#Rows", "Optimized [s]", "Unoptimized [s]"),
      rows.map(r => Seq(r.nRows.toString, cell(r.optimizedS), cell(r.unoptimizedS))),
    )
  }
}
