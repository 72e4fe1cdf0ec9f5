package repro.fdiscovery

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.{FD, FDs, Instance}

/** Functional-dependency discovery — the Metanome substitute.
  *
  * The paper feeds its plaque test with left-reduced FDs with a single RHS
  * attribute, discovered by Metanome [11]. This module implements the same
  * contract: level-wise (apriori-style) discovery of *minimal* FDs up to a
  * configurable LHS size.
  *
  *  - [[discoverLocal]] runs over an in-memory [[Instance]] (the evaluation
  *    datasets have ≤ 150 rows — exactly the paper's setting);
  *  - [[discoverSparkUnary]] runs the unary (`A → B`) level as distributed
  *    `groupBy/countDistinct` scans, one pass per candidate LHS, for data
  *    that does not fit the driver;
  *  - [[holdsSpark]] verifies a single FD distributively.
  *
  * Both paths are cross-checked against each other and against the DuckDB
  * oracle in the test suite.
  */
object FDDiscovery {

  /** All minimal FDs with `|LHS| ∈ [1, maxLhs]` that hold in `inst`.
    *
    * Constant columns are reported as `A → B` for every other attribute `A`
    * (the left-reduced unary form a profiler emits for a single-valued
    * domain; the paper's echocardiogram/NCVoter discussion relies on it).
    */
  def discoverLocal(inst: Instance, maxLhs: Int = 2): Vector[FD] = {
    val cols = inst.attrs.indices.toVector
    val out = Vector.newBuilder[FD]
    for (rhs <- cols) {
      var minimal = Vector.empty[Set[Int]]
      var level: Vector[Set[Int]] = cols.filterNot(_ == rhs).map(Set(_))
      var l = 1
      while (l <= maxLhs && level.nonEmpty) {
        val holding = level.filter(lhs => holdsLocal(inst, lhs, rhs))
        minimal ++= holding
        out ++= holding.map(FD(_, rhs))
        if (l < maxLhs) {
          level = cols
            .filterNot(_ == rhs)
            .combinations(l + 1)
            .map(_.toSet)
            .filterNot(cand => minimal.exists(_.subsetOf(cand)))
            .toVector
        } else level = Vector.empty
        l += 1
      }
    }
    out.result()
  }

  /** Does `lhs -> rhs` hold in the instance? (Definition 2.3, hash-grouped.) */
  def holdsLocal(inst: Instance, lhs: Set[Int], rhs: Int): Boolean = {
    if (lhs.contains(rhs)) return true
    val l = lhs.toVector.sorted
    val seen = scala.collection.mutable.HashMap.empty[Vector[Int], Int]
    inst.rows.forall { row =>
      val key = l.map(row)
      seen.getOrElseUpdate(key, row(rhs)) == row(rhs)
    }
  }

  /** Name-level convenience over a DataFrame (collects via [[Instance]]). */
  def discover(df: DataFrame, orderBy: String, maxLhs: Int = 2): (Instance, Vector[FD]) = {
    val inst = Instance.fromDataFrame(df, orderBy)
    (inst, discoverLocal(inst, maxLhs))
  }

  /** Render FDs back to attribute names. */
  def byNames(inst: Instance, fds: Seq[FD]): Vector[(Seq[String], String)] =
    fds.map(f => (f.lhs.toSeq.sorted.map(inst.attrs), inst.attrs(f.rhs))).toVector

  /** Distributed verification of one FD: `lhs -> rhs` holds iff no LHS group
    * contains two distinct RHS values (a single groupBy/aggregate scan).
    */
  def holdsSpark(df: DataFrame, lhs: Seq[String], rhs: String): Boolean = {
    if (lhs.contains(rhs)) return true
    df.groupBy(lhs.map(col): _*)
      .agg(countDistinct(col(rhs)).as("d"))
      .agg(max(col("d")).as("m"))
      .collect()(0)
      .getLong(0) <= 1L
  }

  /** Distributed unary discovery: all minimal `A -> B` FDs, one
    * groupBy/aggregate pass per candidate LHS attribute (all RHS candidates
    * are aggregated in the same scan).
    */
  def discoverSparkUnary(df: DataFrame, exclude: Set[String] = Set.empty): Vector[(Seq[String], String)] = {
    val cols = df.columns.filterNot(exclude).toVector
    val out = Vector.newBuilder[(Seq[String], String)]
    for (a <- cols) {
      val others = cols.filterNot(_ == a)
      if (others.nonEmpty) {
        // Two-stage: per-group distinct counts, then the max over groups.
        val grouped = df.groupBy(col(a)).agg(countDistinct(col(others.head)).as(others.head),
          others.tail.map(b => countDistinct(col(b)).as(b)): _*)
        val maxima = grouped.agg(max(col(others.head)).as(others.head),
          others.tail.map(b => max(col(b)).as(b)): _*).collect()(0)
        for ((b, i) <- others.zipWithIndex if maxima.getLong(i) <= 1L)
          out += ((Seq(a), b))
      }
    }
    out.result()
  }
}
