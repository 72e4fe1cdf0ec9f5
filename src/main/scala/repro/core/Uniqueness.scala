package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Optimization 1 (Definition 3.1 / Prop. 3.2): a position `p = (j, B)` has
  * `INF = 1` iff no other tuple agrees with tuple `j` on the LHS of any FD
  * `L→B` — then its entropy need not be computed at all.
  *
  * Two implementations:
  *  - a local one over [[Instance]], used inside the exact/MC pipelines;
  *  - a distributed one over DataFrames using window `count` per FD LHS —
  *    the groupBy/aggregate redundancy scan that scales past driver memory.
  *  They are cross-checked against each other and against the DuckDB oracle
  *  in the test suite.
  */
object Uniqueness {

  /** Positions that are NOT unique w.r.t. the FD set (Def. 3.1), i.e. whose
    * entropy is strictly below 1 by Prop. 3.2.
    */
  def nonUniquePositions(inst: Instance, fds: Seq[FD]): Set[Pos] = {
    val out = Set.newBuilder[Pos]
    for (fd <- fds if !fd.trivial) {
      val lhs = fd.lhs.toVector.sorted
      val groups = inst.rows.indices.groupBy(j => lhs.map(c => inst.rows(j)(c)))
      for ((_, rowsIdx) <- groups if rowsIdx.size > 1; j <- rowsIdx)
        out += Pos(j, fd.rhs)
    }
    out.result()
  }

  /** Rows (indices) that contain at least one non-unique position — the set
    * `J₀` of Prop. 3.3.
    */
  def nonUniqueRows(inst: Instance, fds: Seq[FD]): Set[Int] =
    nonUniquePositions(inst, fds).map(_.row)

  /** Distributed variant: returns a DataFrame `(idCol, attr)` listing every
    * non-unique position of `df` (tuples identified by `idCol`) w.r.t. the
    * name-level FDs. One window-count scan per FD; Spark shares shuffles
    * across FDs with a common LHS.
    */
  def nonUniqueDF(df: DataFrame, fds: Seq[(Seq[String], String)], idCol: String): DataFrame = {
    require(fds.nonEmpty, "no FDs given")
    val perFd = fds.filterNot { case (l, r) => l.contains(r) }.map { case (lhs, rhs) =>
      val w = Window.partitionBy(lhs.map(col): _*)
      df.select(col(idCol), count(lit(1)).over(w).as("grp_n"))
        .where(col("grp_n") > 1)
        .select(col(idCol), lit(rhs).as("attr"))
    }
    perFd.reduce(_.union(_)).distinct()
  }

  /** Distributed count of non-unique positions per attribute: the headline
    * statistic of a redundancy scan (`attr -> #cells with entropy < 1`).
    */
  def nonUniqueCountsDF(df: DataFrame, fds: Seq[(Seq[String], String)], idCol: String): DataFrame =
    nonUniqueDF(df, fds, idCol).groupBy(col("attr")).agg(count(lit(1)).as("n_cells"))

  /** Convenience: a Column expression `true` iff the FD `lhs -> rhs` holds in
    * `df` (used by discovery verification).
    */
  def fdHolds(df: DataFrame, lhs: Seq[String], rhs: String): Boolean = {
    val maxDistinct = df
      .groupBy(lhs.map(col): _*)
      .agg(countDistinct(col(rhs)).as("d"))
      .agg(max(col("d")).as("m"))
      .collect()(0)
      .getLong(0)
    maxDistinct <= 1L
  }
}
