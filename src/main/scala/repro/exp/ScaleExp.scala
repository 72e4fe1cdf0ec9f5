package repro.exp

import org.apache.spark.sql.SparkSession

import repro.scale.WitnessStats

/** Beyond-the-paper scaling probe (outlook §6): the Prop. 3.2 duplicate-group
  * scan as a distributed dataflow over denormalised TPC-H-lite data at a
  * given scale factor. Reports the per-FD redundancy profile and the
  * end-to-end scan time.
  */
object ScaleExp {

  final case class Run(sf: Double, seconds: Double, table: String)

  def run(spark: SparkSession, sf: Double): Run = {
    val df = WitnessStats.lineitemDenorm(spark, sf)
    val (profile, ms) = Experiments.timeMs {
      WitnessStats.profile(spark, df, WitnessStats.denormFds).collect()
    }
    val header = Seq("fd", "holds", "n_groups", "n_dup_groups", "n_nonunique_cells", "n_witness_pairs")
    val rows = profile.toSeq.map(r => header.indices.map(i => String.valueOf(r.get(i))))
    Run(sf, ms / 1000.0, Experiments.formatTable(header, rows))
  }

  def format(r: Run): String =
    s"SF=${r.sf}  scan=${f"${r.seconds}%.1f"}s\n${r.table}"
}
