package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class ClausesSpec extends AnyFunSuite {

  private val ex34 = Instance(
    Vector("A", "B", "C", "D"),
    Vector(Vector(7, 2, 8, 4), Vector(5, 2, 8, 6), Vector(7, 2, 8, 6)),
  )
  private val fds = Vector(FD(Set(0), 2)) // A -> C

  test("witness clause for Example 3.4, position (0,C)") {
    val cls = Clauses.forPosition(ex34, fds, Pos(0, 2))
    assert(cls == Vector(Set(Pos(0, 0), Pos(2, 0), Pos(2, 2))))
  }

  test("no clauses for a unique position") {
    assert(Clauses.forPosition(ex34, fds, Pos(1, 2)).isEmpty)
  }

  test("no clauses for an attribute without an FD RHS") {
    assert(Clauses.forPosition(ex34, fds, Pos(0, 0)).isEmpty)
    assert(Clauses.forPosition(ex34, fds, Pos(0, 3)).isEmpty)
  }

  test("trivial FDs generate no clauses") {
    assert(Clauses.forPosition(ex34, Vector(FD(Set(2), 2)), Pos(0, 2)).isEmpty)
  }

  test("empty-LHS FD clauses contain only the witness RHS cell") {
    // B is constant: {} -> B has every other row as witness.
    val cls = Clauses.forPosition(ex34, Vector(FD(Set.empty[Int], 1)), Pos(0, 1))
    assert(cls.toSet == Set(Set(Pos(1, 1)), Set(Pos(2, 1))))
  }

  test("minimize removes duplicate clauses") {
    val c = Set(Pos(0, 0), Pos(1, 0))
    assert(Clauses.minimize(Seq(c, c)) == Vector(c))
  }

  test("minimize removes superset clauses") {
    val small = Set(Pos(0, 0))
    val big = Set(Pos(0, 0), Pos(1, 1))
    assert(Clauses.minimize(Seq(big, small)) == Vector(small))
  }

  test("eval: empty clause set is always fulfilled") {
    assert(Clauses.eval(Vector.empty, Set.empty))
  }

  test("eval requires every clause hit") {
    val cls = Vector(Set(Pos(0, 0)), Set(Pos(1, 1)))
    assert(!Clauses.eval(cls, Set(Pos(0, 0))))
    assert(Clauses.eval(cls, Set(Pos(0, 0), Pos(1, 1))))
  }

  test("forAllPositions agrees with forPosition everywhere (Example 3.4)") {
    val all = Clauses.forAllPositions(ex34, fds)
    for (p <- ex34.positions) {
      assert(all.getOrElse(p, Vector.empty).toSet == Clauses.forPosition(ex34, fds, p).toSet, s"at $p")
    }
  }

  test("forAllPositions agrees with forPosition on the CD example") {
    val inst = Instance.encode(
      Seq("ID", "Album", "Band", "BYear", "RYear", "Track", "Title"),
      Seq(
        Seq(1, "NTK", "Ana", 1999, 2000, 1, "t1"),
        Seq(1, "NTK", "Ana", 1999, 2000, 2, "t2"),
        Seq(1, "NTK", "Ana", 1999, 2000, 3, "t3"),
        Seq(2, "WYWH", "PF", 1965, 1975, 1, "t4"),
        Seq(3, "FoN", "Ana", 1999, 2001, 1, "t5"),
      ))
    val cd = FDs.closure(FDs.byName(inst.attrs, Seq(
      Seq("ID") -> "Album", Seq("ID") -> "Band", Seq("ID") -> "BYear",
      Seq("ID") -> "RYear", Seq("Band") -> "BYear", Seq("ID", "Track") -> "Title")))
    val all = Clauses.forAllPositions(inst, cd)
    for (p <- inst.positions)
      assert(all.getOrElse(p, Vector.empty).toSet == Clauses.forPosition(inst, cd, p).toSet, s"at $p")
  }

  // The load-bearing equivalence: clause evaluation == the literal
  // fulfills-with-variables semantics, on randomized repaired instances.
  for (seed <- 0 until 40) {
    test(s"clause eval ≡ Fulfills.check with fresh value (random instance, seed=$seed)") {
      val (inst, fds) = TestGen.instanceWithFds(seed)
      val closed = FDs.closure(fds)
      val rng = new Random(seed * 31 + 7)
      for (_ <- 0 until 20) {
        val p = inst.positions(rng.nextInt(inst.positions.size))
        val q = TestGen.randomQ(inst, p, rng)
        val cls = Clauses.forPosition(inst, closed, p)
        val fresh = inst.freshValue(p.col)
        val viaClauses = Clauses.eval(cls, q)
        val viaFulfills = Fulfills.check(inst, closed, q, Map(p -> fresh))
        assert(viaClauses == viaFulfills,
          s"inst=$inst fds=$fds p=$p q=$q clauses=$cls")
      }
    }
  }
}
