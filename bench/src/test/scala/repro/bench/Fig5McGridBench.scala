package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.SparkSpec
import repro.exp.Fig5Exp

/** Reproduces **Figure 5** (a runtime table in the paper): Monte-Carlo
  * runtime for different satellite-data prefixes × iteration counts, with the
  * §3.1 optimizations enabled.
  *
  * Paper reference values (single-threaded Java, seconds):
  * {{{
  *   rows      1k      10k     100k      1M
  *    10      0.3      0.9      5.2     45.2
  *    50      2.1     16.4    162.8   1565.1
  *   100      7.7     71.9    656.0   6526.3
  *   150     18.0    166.7   1646.8  16051.4
  * }}}
  * The grid times the single-threaded clause-based sampler (the paper's
  * prototype is single-threaded too), so absolute numbers are ~10³ smaller;
  * the reproduced *shape* is: runtime ≈ linear in iterations, growing with
  * row count.
  */
class Fig5McGridBench extends AnyFunSuite with SparkSpec {

  private lazy val cells = {
    val c = Fig5Exp.run(spark)
    println("\n=== Figure 5: MC runtime grid [s] (rows x iterations) ===")
    println(Fig5Exp.format(c))
    c
  }

  private def t(rows: Int, iters: Long): Double =
    cells.find(c => c.rows == rows && c.iterations == iters).get.seconds

  test("Fig. 5: the full grid is measured") {
    assert(cells.size == Fig5Exp.DefaultRows.size * Fig5Exp.DefaultIters.size)
    assert(cells.forall(_.seconds > 0.0))
  }

  test("Fig. 5: at 150 rows, runtime is roughly linear in the iteration count") {
    assert(t(150, 1000000) > 5 * t(150, 10000),
      s"${t(150, 10000)} vs ${t(150, 1000000)}")
  }

  test("Fig. 5: at 1M iterations, 150 rows cost more than 10 rows") {
    assert(t(150, 1000000) > 2 * t(10, 1000000),
      s"${t(10, 1000000)} vs ${t(150, 1000000)}")
  }

  test("Fig. 5: per-iteration work grows with the instance (paper: input size dominates)") {
    // Marginal cost of 990k extra iterations at 150 rows vs at 10 rows.
    val marginal150 = t(150, 1000000) - t(150, 10000)
    val marginal10 = t(10, 1000000) - t(10, 10000)
    assert(marginal150 > marginal10,
      s"marginal secs: 10 rows=$marginal10, 150 rows=$marginal150")
  }

  test("Fig. 5: every prefix yields a complete entropy matrix") {
    // Sanity: re-run one small cell and check the result object.
    val prep = repro.exp.Experiments.satellitesPrefix(spark, 30)
    val res = repro.core.PlaqueTest.run(spark, prep.inst, prep.fds, 1000)
    assert(res.entropies.size == 30)
    assert(res.entropies.head.size == 8)
  }
}
