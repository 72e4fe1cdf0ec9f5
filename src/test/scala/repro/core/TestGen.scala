package repro.core

import scala.util.Random

/** Deterministic random generators for property-style tests: small instances
  * repaired to fulfil a random FD set.
  */
object TestGen {

  /** A random instance/FD pair with `I ⊨ F` (repaired by value propagation;
    * generation is retried until the repair converges).
    */
  def instanceWithFds(seed: Long, maxRows: Int = 4, maxCols: Int = 4, maxFds: Int = 3): (Instance, Vector[FD]) = {
    val rng = new Random(seed)
    var attempt = 0
    while (attempt < 50) {
      val nRows = 2 + rng.nextInt(maxRows - 1)
      val nCols = 2 + rng.nextInt(maxCols - 1)
      val attrs = Vector.tabulate(nCols)(k => s"A$k")
      var rows = Vector.fill(nRows)(Vector.fill(nCols)(rng.nextInt(3)))
      val fds = Vector.fill(1 + rng.nextInt(maxFds)) {
        val rhs = rng.nextInt(nCols)
        val lhsSize = 1 + rng.nextInt(math.min(2, nCols - 1))
        val lhs = rng.shuffle((0 until nCols).filterNot(_ == rhs).toList).take(lhsSize).toSet
        FD(lhs, rhs)
      }.distinct
      // Repair: force each FD's RHS to the group representative, to fixpoint.
      var it = 0
      var stable = false
      while (it < 25 && !stable) {
        stable = true
        for (fd <- fds) {
          val lhs = fd.lhs.toVector.sorted
          val repr = scala.collection.mutable.Map.empty[Vector[Int], Int]
          rows = rows.map { r =>
            val key = lhs.map(r)
            val v = repr.getOrElseUpdate(key, r(fd.rhs))
            if (r(fd.rhs) != v) { stable = false; r.updated(fd.rhs, v) }
            else r
          }
        }
        it += 1
      }
      val inst = Instance(attrs, rows)
      if (stable && Fulfills.holdsAll(inst, FDs.closure(fds)))
        return (inst, fds)
      attempt += 1
    }
    throw new IllegalStateException(s"no repairable instance for seed $seed")
  }

  /** A random subset of positions excluding `p`. */
  def randomQ(inst: Instance, p: Pos, rng: Random): Set[Pos] =
    inst.positions.filterNot(_ == p).filter(_ => rng.nextBoolean()).toSet
}
