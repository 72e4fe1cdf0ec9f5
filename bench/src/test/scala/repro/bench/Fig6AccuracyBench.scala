package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.SparkSpec
import repro.exp.Fig6Exp

/** Reproduces **Figure 6**: the visual stability of the Monte-Carlo
  * approximation on the satellites dataset under a 100× iteration gap
  * (paper: 1k vs 1M — 1000×; here 1k vs 100k, same statistical regime).
  *
  * Paper reference: max cell difference ≈ 0.048; 117 cells below 1; only 9
  * cells differ by more than 0.02.
  */
class Fig6AccuracyBench extends AnyFunSuite with SparkSpec {

  private lazy val cmp = {
    val c = Fig6Exp.run(spark, lowIters = 1000, highIters = 100000)
    println("\n=== Figure 6: MC accuracy, satellites ===")
    println(Fig6Exp.format(c))
    c
  }

  test("Fig. 6: ~117 cells below entropy 1 (ours: 119 by construction)") {
    assert(cmp.cellsBelowOne >= 110 && cmp.cellsBelowOne <= 125, s"got ${cmp.cellsBelowOne}")
  }

  test("Fig. 6: the maximum difference stays small (paper: 0.048)") {
    assert(cmp.maxDiff < 0.09, s"got ${cmp.maxDiff}")
  }

  test("Fig. 6: only a small minority of cells differ by more than 0.02") {
    assert(cmp.cellsDiffAbove002 < cmp.cellsBelowOne / 2,
      s"${cmp.cellsDiffAbove002} of ${cmp.cellsBelowOne}")
  }

  test("Fig. 6: unique cells agree exactly between the two runs") {
    for {
      j <- cmp.low.entropies.indices
      k <- cmp.low.entropies(j).indices
      if !cmp.low.nonUnique.contains(repro.core.Pos(j, k))
    } assert(cmp.low.entropies(j)(k) == 1.0 && cmp.high.entropies(j)(k) == 1.0)
  }

  test("Fig. 6: both runs agree on which columns carry plaque") {
    assert(cmp.low.plaqueColumns == cmp.high.plaqueColumns)
  }

  test("Fig. 6: the rendered heat maps are nearly identical (the paper's point)") {
    val lowShades = repro.viz.Heatmap.render(cmp.low).split("\n")
    val highShades = repro.viz.Heatmap.render(cmp.high).split("\n")
    val diffChars = lowShades.zip(highShades).map { case (a, b) =>
      a.zip(b).count { case (x, y) => x != y }
    }.sum
    // The low-iteration noise (±0.016 at 1k) may push cells across one shade
    // boundary, and the per-table min-entropy calibration shifts with it
    // (exactly the sensitivity the paper notes) — but at most a minority of
    // the ~119 colored cells may change glyph, and no white cell ever does.
    assert(diffChars <= 60, s"$diffChars differing glyphs")
  }
}
