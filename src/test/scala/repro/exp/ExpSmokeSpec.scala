package repro.exp

import org.scalatest.funsuite.AnyFunSuite

import repro.SparkSpec

/** Fast smoke checks of the experiment runners (the full sweeps live in the
  * bench project).
  */
class ExpSmokeSpec extends AnyFunSuite with SparkSpec {

  test("Fig2Exp covers the full grid and matches Theorem 3.6") {
    val cells = Fig2Exp.run()
    assert(cells.size == Fig2Exp.EpsGrid.size * Fig2Exp.DeltaGrid.size)
    val spot = cells.find(c => c.eps == 0.001 && c.delta == 0.001).get
    assert(spot.iterations >= 15200000L)
    assert(Fig2Exp.format(cells).contains(spot.iterations.toString))
  }

  test("Table1Exp runs rows 1-2 with a small budget") {
    val rows = Table1Exp.run(spark, maxRows = 2, budgetMs = 30000L)
    assert(rows.map(_.nRows) == Seq(1, 2))
    // One satellite row has no duplicate groups at all: both modes instant.
    assert(rows.head.optimizedS.exists(_ < 5.0))
    assert(rows.head.unoptimizedS.exists(_ < 30.0))
    assert(Table1Exp.format(rows).contains("#Rows"))
  }

  test("satellitesPrefix truncates rows but keeps the FDs") {
    val p5 = Experiments.satellitesPrefix(spark, 5)
    val full = Experiments.prepare(spark, "satellites")
    assert(p5.inst.nRows == 5)
    assert(p5.inst.attrs == full.inst.attrs)
    assert(p5.fds == full.fds)
  }

  test("prefix instances fulfil the FDs discovered on the full data") {
    for (n <- Seq(1, 3, 10)) {
      val p = Experiments.satellitesPrefix(spark, n)
      assert(repro.core.Fulfills.holdsAll(p.inst, p.fds), s"prefix $n")
    }
  }

  test("Fig3Exp runs one dataset end to end (iris, small iterations)") {
    val s = Fig3Exp.runOne(spark, "iris", 2000)
    assert(s.rows == 150 && s.cols == 5)
    assert(s.plaqueColumns == Vector("class"))
    assert(s.minEntropy < 1.0)
    assert(Fig3Exp.format(Seq(s)).contains("iris"))
  }

  test("Fig4Exp histogram accounts for all 1200 cells") {
    val h = Fig4Exp.run(spark, iterations = 2000)
    assert(h.cells == 1200)
    assert(h.buckets.map(_._2).sum == 1200)
    assert(h.fractionOnes > 0.85)
    assert(Fig4Exp.format(h).contains("fractionOnes"))
  }

  test("Fig5Exp produces a complete timing grid (tiny)") {
    val cells = Fig5Exp.run(spark, rowCounts = Seq(10, 20), iterCounts = Seq(500L, 1000L))
    assert(cells.size == 4)
    assert(cells.forall(_.seconds >= 0.0))
    assert(Fig5Exp.format(cells).contains("#Rows"))
  }

  test("Fig6Exp compares two MC runs (tiny)") {
    val c = Fig6Exp.run(spark, lowIters = 500, highIters = 5000)
    assert(c.maxDiff >= 0.0 && c.maxDiff <= 0.3)
    assert(c.cellsBelowOne > 100 && c.cellsBelowOne < 140)
    assert(Fig6Exp.format(c).contains("cells < 1"))
  }

  test("ScaleExp runs at a tiny scale factor") {
    val r = ScaleExp.run(spark, sf = 0.002)
    assert(r.seconds > 0)
    assert(r.table.contains("l_orderkey"))
    assert(ScaleExp.format(r).contains("SF=0.002"))
  }

  test("formatTable aligns columns") {
    val t = Experiments.formatTable(Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    val lines = t.split("\n")
    assert(lines.length == 4)
    assert(lines.map(_.length).distinct.size <= 2)
  }
}
