package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.exp.Fig2Exp
import repro.core.MonteCarlo

/** Reproduces **Figure 2** (as a table): Monte-Carlo iterations required for
  * accuracy ε at confidence 1−δ.
  *
  * Paper reference values: ε=δ=0.001 → ≥ 1.52·10⁷ iterations; ε=0.01,
  * δ=0.001 → 1.52·10⁵; ε=0.04 at 99.9 % → ≈ 10,000 (Example 3.7 and the
  * Fig. 2 discussion).
  */
class Fig2IterationsBench extends AnyFunSuite {

  private lazy val cells = {
    val c = Fig2Exp.run()
    println("\n=== Figure 2: required iterations (rows: eps, cols: delta) ===")
    println(Fig2Exp.format(c))
    c
  }

  test("Fig. 2: full grid is produced") {
    assert(cells.size == Fig2Exp.EpsGrid.size * Fig2Exp.DeltaGrid.size)
  }

  test("Fig. 2: Example 3.7 spot value 1.52e7 at eps=delta=0.001") {
    val n = cells.find(c => c.eps == 0.001 && c.delta == 0.001).get.iterations
    assert(n >= 15200000L && n < 15210000L, s"got $n")
  }

  test("Fig. 2: Example 3.7 spot value 1.52e5 at eps=0.01, delta=0.001") {
    val n = cells.find(c => c.eps == 0.01 && c.delta == 0.001).get.iterations
    assert(n >= 152000L && n < 152100L, s"got $n")
  }

  test("Fig. 2: ~10,000 iterations at eps=0.04, 99.9% confidence") {
    val n = cells.find(c => c.eps == 0.04 && c.delta == 0.001).get.iterations
    assert(n > 9000L && n < 10500L, s"got $n")
  }

  test("Fig. 2: iterations grow quadratically as eps shrinks") {
    val n1 = cells.find(c => c.eps == 0.1 && c.delta == 0.01).get.iterations
    val n2 = cells.find(c => c.eps == 0.01 && c.delta == 0.01).get.iterations
    assert(math.abs(n2.toDouble / n1 - 100.0) < 1.0, s"$n1 vs $n2")
  }

  test("Fig. 2: iterations grow as confidence rises") {
    val byDelta = Fig2Exp.DeltaGrid.map(d => cells.find(c => c.eps == 0.01 && c.delta == d).get.iterations)
    assert(byDelta == byDelta.sorted)
  }

  test("Fig. 2: the bound matches the closed form for every cell") {
    for (c <- cells)
      assert(c.iterations == math.ceil(2.0 * math.log(2.0 / c.delta) / (c.eps * c.eps)).toLong)
  }

  test("Fig. 2: accuracy() inverts requiredIterations()") {
    for (c <- cells) {
      val eps = MonteCarlo.accuracy(c.iterations, c.delta)
      assert(eps <= c.eps + 1e-9, s"eps=$eps vs ${c.eps}")
    }
  }
}
