package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core.PlaqueTest

/** Figure 6: visual stability of the Monte-Carlo approximation — compare the
  * satellites entropy matrix at a low and a high iteration count. The paper
  * (1k vs 1M iterations) reports a maximum cell difference of ≈ 0.048, 117
  * cells below 1, and only 9 cells with a difference above 0.02.
  */
object Fig6Exp {

  final case class Comparison(
      lowIters: Long,
      highIters: Long,
      low: PlaqueTest.Result,
      high: PlaqueTest.Result,
      maxDiff: Double,
      cellsBelowOne: Int,
      cellsDiffAbove002: Int,
  )

  def run(spark: SparkSession, lowIters: Long = 1000L, highIters: Long = 100000L): Comparison = {
    val prep = Experiments.prepare(spark, "satellites")
    val low = PlaqueTest.run(spark, prep.inst, prep.fds, lowIters, seed = 1)
    val high = PlaqueTest.run(spark, prep.inst, prep.fds, highIters, seed = 2)
    val diffs = for {
      j <- prep.inst.rows.indices
      k <- prep.inst.attrs.indices
    } yield math.abs(low.entropies(j)(k) - high.entropies(j)(k))
    Comparison(
      lowIters,
      highIters,
      low,
      high,
      diffs.max,
      high.entropies.flatten.count(_ < 1.0),
      diffs.count(_ > 0.02),
    )
  }

  def format(c: Comparison): String =
    f"""iterations compared: ${c.lowIters} vs ${c.highIters}
       |max |entropy diff|  : ${c.maxDiff}%.4f
       |cells < 1 (high run): ${c.cellsBelowOne}
       |cells with diff>0.02: ${c.cellsDiffAbove002}""".stripMargin
}
