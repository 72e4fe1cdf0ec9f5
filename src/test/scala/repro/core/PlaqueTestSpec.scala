package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.{Oracle, SparkSpec}
import repro.data.Datasets

class PlaqueTestSpec extends AnyFunSuite with SparkSpec {

  private val ex34 = Instance(
    Vector("A", "B", "C", "D"),
    Vector(Vector(7, 2, 8, 4), Vector(5, 2, 8, 6), Vector(7, 2, 8, 6)),
  )
  private val fds = Vector(FD(Set(0), 2))

  test("runExact reproduces the Example 3.4 matrix") {
    val res = PlaqueTest.runExact(ex34, fds)
    assert(res.entropies == Vector(
      Vector(1.0, 1.0, 0.875, 1.0),
      Vector(1.0, 1.0, 1.0, 1.0),
      Vector(1.0, 1.0, 0.875, 1.0),
    ))
  }

  test("runExact reports non-unique positions") {
    val res = PlaqueTest.runExact(ex34, fds)
    assert(res.nonUnique == Set(Pos(0, 2), Pos(2, 2)))
  }

  test("run (Spark MC) approximates the exact matrix") {
    val res = PlaqueTest.run(spark, ex34, fds, 100000)
    assert(res.entropies(1) == Vector(1.0, 1.0, 1.0, 1.0))
    assert(math.abs(res.entropies(0)(2) - 0.875) < 0.015)
    assert(math.abs(res.entropies(2)(2) - 0.875) < 0.015)
  }

  test("minEntropy and fractionOnes") {
    val res = PlaqueTest.runExact(ex34, fds)
    assert(res.minEntropy == 0.875)
    assert(math.abs(res.fractionOnes - 10.0 / 12.0) < 1e-12)
  }

  test("plaqueColumns names exactly the colored attributes") {
    val res = PlaqueTest.runExact(ex34, fds)
    assert(res.plaqueColumns == Vector("C"))
  }

  test("zeroColumns is empty when no column is all-zero") {
    assert(PlaqueTest.runExact(ex34, fds).zeroColumns().isEmpty)
  }

  test("zeroColumns finds an all-redundant column") {
    // Constant column B (the echocardiogram "name" pattern): the empty-LHS FD
    // gives every other row as a witness, so entropies collapse to ~2^-11.
    val inst = Instance(
      Vector("A", "B"),
      Vector.tabulate(12)(j => Vector(j % 3, 9)),
    )
    val res = PlaqueTest.runExact(inst, Vector(FD(Set.empty[Int], 1)), maxVars = 26)
    assert(res.zeroColumns(tol = 0.1) == Vector("B"))
    assert(res.entropies(0)(1) < 0.001)
  }

  test("histogram buckets cover all cells") {
    val res = PlaqueTest.runExact(ex34, fds)
    val h = res.histogram(0.05)
    assert(h.map(_._2).sum == 12)
    assert(math.abs(h.last._1 - 0.95) < 1e-9 && h.last._2 == 10) // the ten 1.0 cells
    assert(h(17)._2 == 2) // bucket [0.85, 0.90) holds the two 0.875 cells
  }

  test("histogram respects custom bucket widths") {
    val res = PlaqueTest.runExact(ex34, fds)
    val h = res.histogram(0.5)
    assert(h == Vector((0.0, 0), (0.5, 12)))
  }

  test("toDF round-trips the matrix and joins with SQL") {
    val res = PlaqueTest.runExact(ex34, fds)
    val df = res.toDF(spark)
    assert(df.count() == 12)
    val below = df.where("entropy < 1.0").collect()
    assert(below.map(r => (r.getLong(0), r.getString(1))).toSet == Set((0L, "C"), (2L, "C")))
  }

  test("toDF aggregate matches the DuckDB oracle") {
    val res = PlaqueTest.runExact(ex34, fds)
    val df = res.toDF(spark)
    val agg = df.groupBy("attr").agg(
      org.apache.spark.sql.functions.expr("cast(count(case when entropy < 1.0 then 1 end) as string) as n_plaque"))
    Oracle.assertEquivalent(
      agg,
      "SELECT attr, CAST(COUNT(CASE WHEN CAST(entropy AS DOUBLE) < 1.0 THEN 1 END) AS VARCHAR) AS n_plaque " +
        "FROM ent GROUP BY attr",
      "ent" -> df,
    )
  }

  test("fromDataFrame end-to-end on the CD example") {
    val res = PlaqueTest.fromDataFrame(
      spark, Datasets.cdCollection(spark), "id", Datasets.cdGenuineFds, 50000)
    // Fig. 1b: Album entropy of the first tuple ≈ 25/32.
    val albumIdx = res.inst.attrIndex("album")
    assert(math.abs(res.entropies(0)(albumIdx) - 25.0 / 32.0) < 0.02)
    val trackIdx = res.inst.attrIndex("track")
    assert(res.entropies.forall(_(trackIdx) == 1.0))
  }

  test("MC run and exact run agree on non-unique position sets") {
    val mc = PlaqueTest.run(spark, ex34, fds, 1000)
    val exact = PlaqueTest.runExact(ex34, fds)
    assert(mc.nonUnique == exact.nonUnique)
  }

  test("closure is applied inside run (transitive plaque)") {
    // A -> B, B -> C: cell (j,C) must pick up clauses from the derived A -> C.
    val inst = Instance(
      Vector("A", "B", "C"),
      Vector(Vector(1, 4, 7), Vector(1, 4, 7), Vector(2, 5, 7)),
    )
    val res = PlaqueTest.runExact(inst, Vector(FD(Set(0), 1), FD(Set(1), 2)))
    // (0,C): clauses from B->C (witness row 1) and derived A->C.
    assert(res.entropies(0)(2) < 1.0)
    assert(res.nonUnique.contains(Pos(0, 2)))
  }
}
