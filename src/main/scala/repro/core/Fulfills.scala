package repro.core

/** Literal implementation of `⊨` for instances containing pairwise-distinct
  * variables (Definition 2.4).
  *
  * An instance whose cells at positions `vars` hold distinct variables and
  * whose cell `p` was overwritten with a value fulfills a single FD
  * `A_1...A_s -> B` iff for all tuple pairs whose `B`-cells are constants and
  * whose LHS cells are constants with equal values, the `B` values agree
  * (variables are pairwise distinct and distinct from every constant, so a
  * tuple with a variable in its LHS can never collide with another tuple).
  *
  * `I ⊨ F` for an instance with variables is *not* `∀f∈F: I ⊨ f` — the paper
  * requires checking every FD in the closure `F*`. Callers therefore pass a
  * closed FD set (see [[FDs.closure]]).
  */
object Fulfills {

  /** Does the modified instance fulfil every FD in `closedFds`?
    *
    * @param inst      the original instance (must fulfil the FDs)
    * @param closedFds the closure `F*`
    * @param vars      positions replaced by pairwise-distinct variables (`Q`)
    * @param put       value overrides, e.g. the fresh value at the probed
    *                  position; an override position must not be in `vars`
    */
  def check(inst: Instance, closedFds: Seq[FD], vars: Set[Pos], put: Map[Pos, Int]): Boolean =
    closedFds.forall(fd => checkOne(inst, fd, vars, put))

  /** Single-FD check, pairwise over tuples (O(fds · rows² · |lhs|) — fine for
    * the tiny instances the naive path is restricted to).
    */
  def checkOne(inst: Instance, fd: FD, vars: Set[Pos], put: Map[Pos, Int]): Boolean = {
    if (fd.trivial) return true
    val lhs = fd.lhs.toArray.sorted
    val n = inst.nRows

    def v(j: Int, k: Int): Int = put.getOrElse(Pos(j, k), inst.rows(j)(k))
    def isVar(j: Int, k: Int): Boolean = vars.contains(Pos(j, k))

    var j1 = 0
    while (j1 < n) {
      if (!isVar(j1, fd.rhs) && lhs.forall(k => !isVar(j1, k))) {
        var j2 = j1 + 1
        while (j2 < n) {
          if (!isVar(j2, fd.rhs) && lhs.forall(k => !isVar(j2, k)) &&
              lhs.forall(k => v(j1, k) == v(j2, k)) &&
              v(j1, fd.rhs) != v(j2, fd.rhs)) return false
          j2 += 1
        }
      }
      j1 += 1
    }
    true
  }

  /** Does the fully-specified instance fulfil `fd` (Definition 2.3)? */
  def holds(inst: Instance, fd: FD): Boolean =
    checkOne(inst, fd, Set.empty, Map.empty)

  /** Does the fully-specified instance fulfil every FD in `fds`? (For
    * instances without variables this is equivalent to fulfilling the
    * closure.)
    */
  def holdsAll(inst: Instance, fds: Seq[FD]): Boolean =
    fds.forall(holds(inst, _))
}
