package repro.core

import org.scalatest.funsuite.AnyFunSuite

class FulfillsSpec extends AnyFunSuite {

  // Example 3.4's instance: F = {A -> C}.
  private val ex34 = Instance(
    Vector("A", "B", "C", "D"),
    Vector(Vector(7, 2, 8, 4), Vector(5, 2, 8, 6), Vector(7, 2, 8, 6)),
  )
  private val aToC = FD(Set(0), 2)

  test("holds on a fulfilled FD") {
    assert(Fulfills.holds(ex34, aToC))
  }

  test("holds detects violation") {
    val bad = Instance(ex34.attrs, ex34.rows.updated(2, Vector(7, 2, 9, 6)))
    assert(!Fulfills.holds(bad, aToC))
  }

  test("trivial FDs always hold") {
    assert(Fulfills.holds(ex34, FD(Set(2), 2)))
    assert(Fulfills.checkOne(ex34, FD(Set(0, 2), 2), Set.empty, Map.empty))
  }

  test("empty-LHS FD holds iff the column is constant") {
    assert(Fulfills.holds(ex34, FD(Set.empty[Int], 1))) // B constant (2,2,2)
    assert(!Fulfills.holds(ex34, FD(Set.empty[Int], 0)))
  }

  test("inserting a fresh value at the RHS of a duplicated group violates") {
    val fresh = ex34.freshValue(2)
    assert(!Fulfills.check(ex34, Seq(aToC), Set.empty, Map(Pos(0, 2) -> fresh)))
  }

  test("inserting a fresh value at a unique-group RHS keeps the FD") {
    // Row 1 has A=5, a singleton group.
    val fresh = ex34.freshValue(2)
    assert(Fulfills.check(ex34, Seq(aToC), Set.empty, Map(Pos(1, 2) -> fresh)))
  }

  test("variables on the violating row's LHS lift the constraint") {
    val fresh = ex34.freshValue(2)
    // Deleting the other group member's A cell breaks the witness.
    assert(Fulfills.check(ex34, Seq(aToC), Set(Pos(2, 0)), Map(Pos(0, 2) -> fresh)))
  }

  test("variables on the probed row's LHS lift the constraint") {
    val fresh = ex34.freshValue(2)
    assert(Fulfills.check(ex34, Seq(aToC), Set(Pos(0, 0)), Map(Pos(0, 2) -> fresh)))
  }

  test("variables on the witness RHS lift the constraint") {
    val fresh = ex34.freshValue(2)
    assert(Fulfills.check(ex34, Seq(aToC), Set(Pos(2, 2)), Map(Pos(0, 2) -> fresh)))
  }

  test("unrelated variables do not lift the constraint") {
    val fresh = ex34.freshValue(2)
    assert(!Fulfills.check(ex34, Seq(aToC), Set(Pos(1, 0), Pos(1, 3), Pos(0, 1)), Map(Pos(0, 2) -> fresh)))
  }

  test("fresh value on an FD LHS never creates a violation") {
    // FD C -> D would be violated only through equal C values; fresh C at
    // (0,2) collides with nobody.
    val cToD = FD(Set(2), 3)
    val inst = Instance(ex34.attrs, Vector(Vector(7, 2, 8, 4), Vector(5, 2, 9, 6)))
    assert(Fulfills.holds(inst, cToD))
    val fresh = inst.freshValue(2)
    assert(Fulfills.check(inst, Seq(cToD), Set.empty, Map(Pos(0, 2) -> fresh)))
  }

  test("holdsAll checks every FD") {
    assert(Fulfills.holdsAll(ex34, Seq(aToC, FD(Set.empty[Int], 1))))
    assert(!Fulfills.holdsAll(ex34, Seq(aToC, FD(Set(1), 0))))
  }

  test("check over multiple FDs requires all of them") {
    val fds = Seq(aToC, FD(Set(1), 2)) // B -> C also holds (B,C constant-ish)
    assert(Fulfills.holdsAll(ex34, fds))
    val fresh = ex34.freshValue(2)
    // Fresh C at row 1: A-group {5} is singleton but B-group is everyone.
    assert(!Fulfills.check(ex34, fds, Set.empty, Map(Pos(1, 2) -> fresh)))
  }
}
