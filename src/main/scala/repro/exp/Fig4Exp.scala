package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core.PlaqueTest

/** Figure 4: histogram over the entropy values of the first 150 rows of the
  * satellites dataset. Headline statistics reported by the paper: ≈ 90 % of
  * the 1 200 cells have entropy 1; the minimum is close to 0.6; only ≈ 5 %
  * are below 0.9.
  */
object Fig4Exp {

  final case class Histogram(
      result: PlaqueTest.Result,
      buckets: Vector[(Double, Int)],
      cells: Int,
      fractionOnes: Double,
      fractionBelow09: Double,
      minEntropy: Double,
  )

  def run(spark: SparkSession, iterations: Long = 20000L): Histogram = {
    val prep = Experiments.prepare(spark, "satellites")
    val res = PlaqueTest.run(spark, prep.inst, prep.fds, iterations)
    val flat = res.entropies.flatten
    Histogram(
      res,
      res.histogram(0.05),
      res.cells,
      res.fractionOnes,
      flat.count(_ < 0.9).toDouble / res.cells,
      res.minEntropy,
    )
  }

  def format(h: Histogram): String = {
    val rows = h.buckets.collect { case (lo, n) if n > 0 =>
      Seq(f"[$lo%.2f, ${lo + 0.05}%.2f)", n.toString, "#" * math.max(1, math.ceil(40.0 * n / h.cells).toInt))
    }
    Experiments.formatTable(Seq("entropy bucket", "cells", ""), rows) +
      f"\n\ncells=${h.cells} fractionOnes=${h.fractionOnes}%.3f fraction<0.9=${h.fractionBelow09}%.3f min=${h.minEntropy}%.3f"
  }
}
