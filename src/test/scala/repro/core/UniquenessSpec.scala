package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.{Oracle, SparkSpec}
import repro.data.Datasets

class UniquenessSpec extends AnyFunSuite with SparkSpec {

  private val ex34 = Instance(
    Vector("A", "B", "C", "D"),
    Vector(Vector(7, 2, 8, 4), Vector(5, 2, 8, 6), Vector(7, 2, 8, 6)),
  )
  private val fds = Vector(FD(Set(0), 2))

  test("Example 3.4: exactly (0,C) and (2,C) are non-unique") {
    assert(Uniqueness.nonUniquePositions(ex34, fds) == Set(Pos(0, 2), Pos(2, 2)))
  }

  test("Example 3.4: non-unique rows are 0 and 2") {
    assert(Uniqueness.nonUniqueRows(ex34, fds) == Set(0, 2))
  }

  test("attributes off every FD RHS are always unique (Prop. 3.2 note)") {
    val nu = Uniqueness.nonUniquePositions(ex34, fds)
    assert(!nu.exists(p => p.col != 2))
  }

  test("Prop. 3.2: INF = 1 iff unique, on Example 3.4") {
    val closed = FDs.closure(fds)
    val nu = Uniqueness.nonUniquePositions(ex34, closed)
    for (p <- ex34.positions) {
      val inf = NaiveEntropy.compute(ex34, closed, p)
      assert((inf == 1.0) == !nu.contains(p), s"at $p inf=$inf")
    }
  }

  // Prop. 3.2 on randomized repaired instances.
  for (seed <- 300 until 330) {
    test(s"Prop. 3.2: INF = 1 iff unique (random instance, seed=$seed)") {
      val (inst, fds) = TestGen.instanceWithFds(seed)
      val closed = FDs.closure(fds)
      val nu = Uniqueness.nonUniquePositions(inst, closed)
      for (p <- inst.positions) {
        val inf = ExactEntropy.viaClauses(inst, closed, p)
        assert((inf == 1.0) == !nu.contains(p), s"at $p inf=$inf inst=$inst fds=$fds")
      }
    }
  }

  test("non-uniqueness ≡ existence of witness clauses") {
    for (seed <- 400 until 420) {
      val (inst, fds) = TestGen.instanceWithFds(seed)
      val closed = FDs.closure(fds)
      val nu = Uniqueness.nonUniquePositions(inst, closed)
      val withClauses = Clauses.forAllPositions(inst, closed).filter(_._2.nonEmpty).keySet
      assert(nu == withClauses, s"seed=$seed inst=$inst")
    }
  }

  test("empty-LHS FD makes every cell of its RHS column non-unique (n>1)") {
    val inst = Instance(Vector("A", "B"), Vector(Vector(1, 5), Vector(2, 5), Vector(3, 5)))
    val nu = Uniqueness.nonUniquePositions(inst, Vector(FD(Set.empty[Int], 1)))
    assert(nu == Set(Pos(0, 1), Pos(1, 1), Pos(2, 1)))
  }

  // --- distributed variant --------------------------------------------------

  private lazy val satDf = Datasets.satellites(spark).cache()
  private val satFds = Seq(Seq("mean_radius") -> "planet", Seq("discovered_by") -> "notes")

  test("nonUniqueDF agrees with the local computation on satellites") {
    val inst = Instance.fromDataFrame(satDf, "id")
    val localNu = Uniqueness
      .nonUniquePositions(inst, FDs.byName(inst.attrs, satFds))
      .map(p => (p.row.toLong, inst.attrs(p.col)))
    val sparkNu = Uniqueness
      .nonUniqueDF(satDf, satFds, "id")
      .collect()
      .map(r => (r.getLong(0), r.getString(1)))
      .toSet
    assert(sparkNu == localNu)
  }

  test("nonUniqueDF matches the DuckDB oracle on satellites") {
    val df = Uniqueness.nonUniqueDF(satDf, satFds, "id")
    Oracle.assertEquivalent(
      df.selectExpr("cast(id as string) as id", "attr"),
      """SELECT id, attr FROM (
        |  SELECT id, 'planet' AS attr, COUNT(*) OVER (PARTITION BY mean_radius) AS c FROM sat
        |  UNION ALL
        |  SELECT id, 'notes' AS attr, COUNT(*) OVER (PARTITION BY discovered_by) AS c FROM sat
        |) WHERE c > 1""".stripMargin,
      "sat" -> satDf,
    )
  }

  test("nonUniqueCountsDF matches the DuckDB oracle on satellites") {
    val df = Uniqueness.nonUniqueCountsDF(satDf, satFds, "id")
    Oracle.assertEquivalent(
      df.selectExpr("attr", "cast(n_cells as string) as n_cells"),
      """SELECT attr, CAST(COUNT(*) AS VARCHAR) AS n_cells FROM (
        |  SELECT id, 'planet' AS attr, COUNT(*) OVER (PARTITION BY mean_radius) AS c FROM sat
        |  UNION ALL
        |  SELECT id, 'notes' AS attr, COUNT(*) OVER (PARTITION BY discovered_by) AS c FROM sat
        |) WHERE c > 1 GROUP BY attr""".stripMargin,
      "sat" -> satDf,
    )
  }

  test("fdHolds is true for the planted satellite FDs") {
    assert(Uniqueness.fdHolds(satDf, Seq("mean_radius"), "planet"))
    assert(Uniqueness.fdHolds(satDf, Seq("discovered_by"), "notes"))
  }

  test("fdHolds is false for a violated FD") {
    assert(!Uniqueness.fdHolds(satDf, Seq("planet"), "mean_radius"))
    assert(!Uniqueness.fdHolds(satDf, Seq("notes"), "discovered_by"))
  }
}
