package repro.core

/** Optimization 2 (Prop. 3.3): restrict the computation to the sub-instance
  * `I(J, K)` where `J ⊇ J₀` (rows containing at least one non-unique
  * position) and `K ⊇ K₀` (attributes appearing in some FD). Entropies of
  * positions inside the subtable are unchanged; everything outside has
  * entropy 1 by Prop. 3.2.
  */
object Reduction {

  /** A reduced instance with the bookkeeping to map positions and FDs
    * between full and sub coordinates.
    *
    * @param sub    the sub-instance `I(J, K)`
    * @param rowMap sub row index -> full row index (ascending)
    * @param colMap sub col index -> full col index (ascending)
    */
  final case class Reduced(sub: Instance, rowMap: Vector[Int], colMap: Vector[Int]) {
    private lazy val rowInv: Map[Int, Int] = rowMap.zipWithIndex.toMap
    private lazy val colInv: Map[Int, Int] = colMap.zipWithIndex.toMap

    /** Map a full-instance position into the subtable, if it is in there. */
    def toSub(p: Pos): Option[Pos] =
      for (r <- rowInv.get(p.row); c <- colInv.get(p.col)) yield Pos(r, c)

    /** Map a subtable position back to full coordinates. */
    def toFull(p: Pos): Pos = Pos(rowMap(p.row), colMap(p.col))

    /** Remap FDs (full column indices) to subtable column indices. All FD
      * attributes are in `K₀ ⊆ K` by construction, so the remap is total.
      */
    def mapFds(fds: Seq[FD]): Vector[FD] =
      fds.map(f => FD(f.lhs.map(colInv), colInv(f.rhs))).toVector
  }

  /** Compute `I(J₀, K₀)` for the given (closed) FD set. */
  def reduce(inst: Instance, fds: Seq[FD]): Reduced = {
    val j0 = Uniqueness.nonUniqueRows(inst, fds).toVector.sorted
    val k0 = fds.filterNot(_.trivial).flatMap(f => f.lhs + f.rhs).distinct.sorted.toVector
    Reduced(inst.subInstance(j0, k0), j0, k0)
  }
}
