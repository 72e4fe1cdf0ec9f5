package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.SparkSpec

class MonteCarloSpec extends AnyFunSuite with SparkSpec {

  test("Example 3.7: eps=delta=0.001 requires ≥ 1.52e7 iterations") {
    val n = MonteCarlo.requiredIterations(0.001, 0.001)
    assert(n >= 15200000L && n <= 15300000L, s"got $n")
  }

  test("Example 3.7: eps=0.01 lowers the iteration count by a factor 100") {
    val n1 = MonteCarlo.requiredIterations(0.001, 0.001)
    val n2 = MonteCarlo.requiredIterations(0.01, 0.001)
    assert(math.abs(n1.toDouble / n2 - 100.0) < 0.01)
  }

  test("Figure 2 spot value: eps=0.04, 99.9% confidence needs ~10000 iterations") {
    val n = MonteCarlo.requiredIterations(0.04, 0.001)
    assert(n >= 9000L && n <= 10500L, s"got $n")
  }

  test("paper RQ1 setting: 100k iterations give accuracy ~0.01 at 99% confidence") {
    assert(MonteCarlo.requiredIterations(0.0103, 0.01) <= 100000L)
    assert(MonteCarlo.accuracy(100000L, 0.01) < 0.0107)
  }

  test("requiredIterations rejects non-positive arguments") {
    assertThrows[IllegalArgumentException](MonteCarlo.requiredIterations(0.0, 0.1))
    assertThrows[IllegalArgumentException](MonteCarlo.requiredIterations(0.1, 0.0))
  }

  test("requiredIterations is monotone in eps and delta") {
    assert(MonteCarlo.requiredIterations(0.01, 0.01) > MonteCarlo.requiredIterations(0.02, 0.01))
    assert(MonteCarlo.requiredIterations(0.01, 0.001) > MonteCarlo.requiredIterations(0.01, 0.01))
  }

  test("mask packs clause cells into ≤64-bit words") {
    val cls = Vector(Set(Pos(0, 0), Pos(1, 0)), Set(Pos(1, 0), Pos(2, 0)))
    val mc = MonteCarlo.mask(cls)
    assert(mc.nVars == 3)
    assert(mc.nWords == 1)
    assert(mc.masks.length == 2)
    assert(mc.masks.forall(w => java.lang.Long.bitCount(w(0)) == 2))
  }

  test("mask handles >64 distinct cells") {
    val cls = Vector.tabulate(70)(i => Set(Pos(i, 0)))
    val mc = MonteCarlo.mask(cls)
    assert(mc.nVars == 70)
    assert(mc.nWords == 2)
  }

  test("estimate of an empty clause set is exactly 1") {
    assert(MonteCarlo.estimate(MonteCarlo.mask(Vector.empty), 100, 1) == 1.0)
  }

  test("estimate of a single 1-cell clause converges to 1/2") {
    val mc = MonteCarlo.mask(Vector(Set(Pos(0, 0))))
    val e = MonteCarlo.estimate(mc, 200000, 7)
    assert(math.abs(e - 0.5) < 0.01, s"got $e")
  }

  test("estimate of a single 3-cell clause converges to 7/8") {
    val mc = MonteCarlo.mask(Vector(Set(Pos(0, 0), Pos(1, 0), Pos(1, 1))))
    val e = MonteCarlo.estimate(mc, 200000, 11)
    assert(math.abs(e - 0.875) < 0.01, s"got $e")
  }

  test("estimate is deterministic in the seed") {
    val mc = MonteCarlo.mask(Vector(Set(Pos(0, 0), Pos(1, 0))))
    assert(MonteCarlo.estimate(mc, 10000, 5) == MonteCarlo.estimate(mc, 10000, 5))
    assert(MonteCarlo.estimate(mc, 10000, 5) != MonteCarlo.estimate(mc, 10000, 6))
  }

  test("estimate with >64 variables converges to the analytic value") {
    // 70 disjoint single-cell clauses: P = (1/2)^70 ≈ 0 — all-miss expected,
    // but 70 clauses of two cells each: P = (3/4)^70.
    val cls = Vector.tabulate(70)(i => Set(Pos(i, 0), Pos(i, 1)))
    val expected = math.pow(0.75, 70)
    val e = MonteCarlo.estimate(MonteCarlo.mask(cls), 100000, 3)
    assert(math.abs(e - expected) < 0.005, s"got $e, expected $expected")
  }

  // Convergence against the exact clause-based value on random instances.
  for (seed <- 500 until 515) {
    test(s"MC converges to the exact entropy (random instance, seed=$seed)") {
      val (inst, fds) = TestGen.instanceWithFds(seed)
      val closed = FDs.closure(fds)
      for (p <- inst.positions.take(6)) {
        val cls = Clauses.forPosition(inst, closed, p)
        val exact = ExactEntropy.viaClauses(cls)
        val est = MonteCarlo.estimate(MonteCarlo.mask(cls), 100000, seed)
        assert(math.abs(est - exact) < 0.015, s"est=$est exact=$exact at $p")
      }
    }
  }

  test("estimatePosition matches estimate over forPosition clauses") {
    val (inst, fds) = TestGen.instanceWithFds(777)
    val closed = FDs.closure(fds)
    val p = inst.positions.head
    val direct = MonteCarlo.estimate(MonteCarlo.mask(Clauses.forPosition(inst, closed, p)), 5000, 9)
    assert(MonteCarlo.estimatePosition(inst, closed, p, 5000, 9) == direct)
  }

  test("matrixLocal gives 1.0 exactly on unique positions") {
    val ex34 = Instance(
      Vector("A", "B", "C", "D"),
      Vector(Vector(7, 2, 8, 4), Vector(5, 2, 8, 6), Vector(7, 2, 8, 6)),
    )
    val mat = MonteCarlo.matrixLocal(ex34, Vector(FD(Set(0), 2)), 20000)
    for (p <- ex34.positions if p != Pos(0, 2) && p != Pos(2, 2))
      assert(mat(p) == 1.0, s"at $p")
    assert(math.abs(mat(Pos(0, 2)) - 0.875) < 0.02)
  }

  // --- Spark-distributed sampler -------------------------------------------

  test("estimateSpark matches the exact value within MC accuracy") {
    val ex34 = Instance(
      Vector("A", "B", "C", "D"),
      Vector(Vector(7, 2, 8, 4), Vector(5, 2, 8, 6), Vector(7, 2, 8, 6)),
    )
    val closed = FDs.closure(Vector(FD(Set(0), 2)))
    val clauses = Map(
      Pos(0, 2) -> (Clauses.forPosition(ex34, closed, Pos(0, 2)): Seq[Set[Pos]]),
      Pos(2, 2) -> (Clauses.forPosition(ex34, closed, Pos(2, 2)): Seq[Set[Pos]]),
    )
    val est = MonteCarlo.estimateSpark(spark, clauses, 100000)
    assert(est.keySet == clauses.keySet)
    for ((p, e) <- est) assert(math.abs(e - 0.875) < 0.015, s"at $p got $e")
  }

  test("estimateSpark on an empty position map is empty") {
    assert(MonteCarlo.estimateSpark(spark, Map.empty, 1000).isEmpty)
  }

  test("estimateSpark splits iterations into blocks without losing any") {
    val clauses = Map(Pos(0, 0) -> (Vector(Set(Pos(1, 1))): Seq[Set[Pos]]))
    // 7 full blocks + remainder: estimate should still be ~0.5.
    val est = MonteCarlo.estimateSpark(spark, clauses, 180001, blockIters = 25000)
    assert(math.abs(est(Pos(0, 0)) - 0.5) < 0.02, s"got $est")
  }

  test("estimateSpark agrees with the local sampler on random instances") {
    for (seed <- 600 until 605) {
      val (inst, fds) = TestGen.instanceWithFds(seed)
      val closed = FDs.closure(fds)
      val all = Clauses.forAllPositions(inst, closed).filter(_._2.nonEmpty)
      if (all.nonEmpty) {
        val spark_ = MonteCarlo.estimateSpark(spark, all.view.mapValues(v => v: Seq[Set[Pos]]).toMap, 50000, seed)
        for ((p, e) <- spark_) {
          val exact = ExactEntropy.viaClauses(all(p))
          assert(math.abs(e - exact) < 0.025, s"seed=$seed p=$p spark=$e exact=$exact")
        }
      }
    }
  }
}
