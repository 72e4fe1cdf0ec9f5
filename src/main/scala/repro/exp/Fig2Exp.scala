package repro.exp

import repro.core.MonteCarlo

/** Figure 2 (tabulated): Monte-Carlo iterations required to reach accuracy ε
  * with confidence 1−δ (Theorem 3.6), including the paper's spot values of
  * Example 3.7.
  */
object Fig2Exp {

  val EpsGrid: Seq[Double] = Seq(0.1, 0.05, 0.04, 0.01, 0.001)
  val DeltaGrid: Seq[Double] = Seq(0.1, 0.05, 0.01, 0.001)

  final case class Cell(eps: Double, delta: Double, iterations: Long)

  def run(): Seq[Cell] =
    for (e <- EpsGrid; d <- DeltaGrid)
      yield Cell(e, d, MonteCarlo.requiredIterations(e, d))

  def format(cells: Seq[Cell]): String = {
    val rows = EpsGrid.map { e =>
      e.toString +: DeltaGrid.map(d => cells.find(c => c.eps == e && c.delta == d).get.iterations.toString)
    }
    Experiments.formatTable("eps \\ delta" +: DeltaGrid.map(_.toString), rows)
  }
}
