package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.SparkSpec
import repro.exp.ScaleExp
import repro.scale.WitnessStats

/** Beyond-the-paper scaling probe (§6 outlook names parallelization as the
  * route to larger datasets): the Prop. 3.2 redundancy scan as distributed
  * groupBy/aggregate dataflows over denormalised TPC-H-lite data, SF 0.01 →
  * SF 0.1 (~600k line items, millions of cells).
  */
class ScaleBench extends AnyFunSuite with SparkSpec {

  private lazy val small = {
    val r = ScaleExp.run(spark, sf = 0.01)
    println("\n=== Scale probe, SF=0.01 ===")
    println(ScaleExp.format(r))
    r
  }

  private lazy val large = {
    val r = ScaleExp.run(spark, sf = 0.1)
    println("\n=== Scale probe, SF=0.1 ===")
    println(ScaleExp.format(r))
    r
  }

  test("scale: the SF=0.1 scan completes in seconds, not hours") {
    assert(large.seconds < 300.0, s"took ${large.seconds}s")
  }

  test("scale: all planted FDs hold at both scale factors") {
    assert(small.table.linesIterator.count(_.contains("true")) == WitnessStats.denormFds.size)
    assert(large.table.linesIterator.count(_.contains("true")) == WitnessStats.denormFds.size)
  }

  test("scale: redundancy counts grow roughly with the scale factor") {
    def firstPairs(t: String): Long =
      t.linesIterator.find(_.contains("l_orderkey -> o_custkey")).get
        .trim.split("\\s+").last.toLong
    val s = firstPairs(small.table)
    val l = firstPairs(large.table)
    assert(l > 3 * s, s"SF0.01=$s SF0.1=$l")
  }

  test("scale: the distributed scan finds non-unique cells for every denorm FD") {
    val prof = WitnessStats
      .profile(spark, WitnessStats.lineitemDenorm(spark, 0.01), WitnessStats.denormFds)
      .collect()
    for (r <- prof) assert(r.getLong(4) > 0, r.getString(0))
  }
}
