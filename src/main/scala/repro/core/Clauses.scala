package repro.core

/** Witness clauses: the combinatorial core behind Props. 2.9, 3.2 and 3.3.
  *
  * Fix a position `p = (j, B)` and a fresh value `a` for column `B`. Since
  * the original instance fulfils `F*` and turning cells into pairwise-distinct
  * variables only removes equalities, the instance `(I_{Q←X})_{p←a}` can
  * violate an FD `L→B' ∈ F*` only via the fresh constant `a`:
  *
  *  - if `B' ≠ B` and `B ∉ L`, the FD is untouched;
  *  - if `B ∈ L`, the fresh `a` makes `p`'s tuple's LHS collide with no one;
  *  - if `B' = B`, a violation arises exactly when some *witness* row
  *    `j' ≠ j` with `t_{j'}[L] = t_j[L]` (original constants) keeps all of
  *    `{(j,c) | c ∈ L} ∪ {(j',c) | c ∈ L} ∪ {(j',B)}` outside `Q`.
  *
  * Hence `(I_{Q←X})_{p←a} ⊨ F*` iff **every** witness clause contains at
  * least one position of `Q` — a monotone-CNF "hit every clause" condition.
  * The equivalence with [[Fulfills.check]] is exercised property-style in the
  * test suite.
  */
object Clauses {

  /** All witness clauses for position `p` under the closed FD set. Clauses
    * are minimized by subsumption (a superset clause is hit whenever its
    * subset is, so it never changes the condition).
    */
  def forPosition(inst: Instance, closedFds: Seq[FD], p: Pos): Vector[Set[Pos]] = {
    val raw = for {
      fd <- closedFds.toVector
      if fd.rhs == p.col && !fd.trivial
      lhs = fd.lhs.toVector.sorted
      base = lhs.map(c => inst.rows(p.row)(c))
      j2 <- inst.rows.indices.toVector
      if j2 != p.row && lhs.map(c => inst.rows(j2)(c)) == base
    } yield lhs.map(c => Pos(p.row, c)).toSet ++ lhs.map(c => Pos(j2, c)) + Pos(j2, fd.rhs)
    minimize(raw)
  }

  /** Witness clauses for every position, computed with one row-grouping pass
    * per FD (O(Σ_fd rows · |lhs|) instead of per-position rescans).
    */
  def forAllPositions(inst: Instance, closedFds: Seq[FD]): Map[Pos, Vector[Set[Pos]]] = {
    val acc = scala.collection.mutable.Map.empty[Pos, Vector[Set[Pos]]].withDefaultValue(Vector.empty)
    for (fd <- closedFds if !fd.trivial) {
      val lhs = fd.lhs.toVector.sorted
      val groups = inst.rows.indices.groupBy(j => lhs.map(c => inst.rows(j)(c)))
      for ((_, rowsIdx) <- groups if rowsIdx.size > 1; j <- rowsIdx) {
        val p = Pos(j, fd.rhs)
        val cls = for (j2 <- rowsIdx.toVector if j2 != j)
          yield lhs.map(c => Pos(j, c)).toSet ++ lhs.map(c => Pos(j2, c)) + Pos(j2, fd.rhs)
        acc(p) = acc(p) ++ cls
      }
    }
    acc.view.mapValues(minimize).toMap
  }

  /** Remove duplicate clauses and clauses that are supersets of another. */
  def minimize(clauses: Seq[Set[Pos]]): Vector[Set[Pos]] = {
    val distinct = clauses.distinct.sortBy(_.size)
    val kept = scala.collection.mutable.ArrayBuffer.empty[Set[Pos]]
    for (c <- distinct if !kept.exists(_.subsetOf(c))) kept += c
    kept.toVector
  }

  /** `X(Q)`: 1 iff deleting the cells in `q` breaks every witness clause. */
  def eval(clauses: Seq[Set[Pos]], q: Set[Pos]): Boolean =
    clauses.forall(c => c.exists(q.contains))
}
