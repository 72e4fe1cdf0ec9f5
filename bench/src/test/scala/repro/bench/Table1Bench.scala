package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.SparkSpec
import repro.exp.Table1Exp

/** Reproduces **Table 1**: runtimes (seconds) for exact entropy computation
  * with and without the §3.1 optimizations on the first `i` rows of the
  * satellites data; "-" marks runs aborted on the time budget (the paper's
  * budget is 24 h, ours defaults to 60 s — shape, not absolute seconds, is
  * the reproduced signal).
  *
  * Paper reference values (seconds):
  * {{{
  *   rows   optimized   unoptimized
  *   1          0.097         0.128
  *   2          0.099         1.318
  *   3          0.320       461.059
  *   4          0.355             -
  *   5     25,221.186             -
  *   6              -             -
  * }}}
  */
class Table1Bench extends AnyFunSuite with SparkSpec {

  private val budgetMs =
    sys.env.getOrElse("TABLE1_BUDGET_MS", "60000").toLong

  private lazy val rows = {
    val r = Table1Exp.run(spark, maxRows = 6, budgetMs = budgetMs)
    println(s"\n=== Table 1 (budget ${budgetMs / 1000}s per run) ===")
    println(Table1Exp.format(r))
    r
  }

  test("Table 1: all six row counts are measured") {
    assert(rows.map(_.nRows) == (1 to 6))
  }

  test("Table 1: both modes finish instantly on 1-2 rows") {
    for (r <- rows.take(2)) {
      assert(r.optimizedS.exists(_ < 10.0), s"row ${r.nRows} optimized ${r.optimizedS}")
      assert(r.unoptimizedS.exists(_ < 10.0), s"row ${r.nRows} unoptimized ${r.unoptimizedS}")
    }
  }

  test("Table 1: optimized completes 3 and 4 rows fast (paper: 0.32s / 0.36s)") {
    assert(rows(2).optimizedS.exists(_ < 10.0), s"got ${rows(2).optimizedS}")
    assert(rows(3).optimizedS.exists(_ < 10.0), s"got ${rows(3).optimizedS}")
  }

  test("Table 1: unoptimized is aborted from 4 rows on (paper: '-')") {
    assert(rows(3).unoptimizedS.isEmpty)
    assert(rows(4).unoptimizedS.isEmpty)
    assert(rows(5).unoptimizedS.isEmpty)
  }

  test("Table 1: optimized survives strictly longer than unoptimized") {
    val lastOpt = rows.lastIndexWhere(_.optimizedS.nonEmpty)
    val lastUnopt = rows.lastIndexWhere(_.unoptimizedS.nonEmpty)
    assert(lastOpt > lastUnopt, s"optimized through ${lastOpt + 1} rows, unoptimized ${lastUnopt + 1}")
  }

  test("Table 1: optimized slows sharply at 5 rows and is aborted at 6 (paper shape)") {
    // Paper: 0.355s at 4 rows vs 25,221s at 5 rows, '-' at 6.
    val t4 = rows(3).optimizedS.get
    rows(4).optimizedS match {
      case Some(t5) => assert(t5 > 5 * t4, s"expected a sharp jump, got $t4 -> $t5")
      case None     => succeed // even the 5-row subtable blew the budget
    }
    assert(rows(5).optimizedS.isEmpty, "6 rows should exceed the budget")
  }

  test("Table 1: unoptimized cost grows monotonically while it completes") {
    val done = rows.flatMap(_.unoptimizedS)
    assert(done == done.sorted, s"got $done")
  }
}
