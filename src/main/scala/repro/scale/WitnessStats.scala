package repro.scale

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.SynthData

/** Distributed redundancy profiling at data scale.
  *
  * The paper's prototype is single-threaded and tops out at 150 rows; its
  * outlook names parallelization as the way to scale. This module runs the
  * building block that dominates that scaling — the per-FD duplicate-group
  * scan behind Prop. 3.2 (which cells can carry plaque at all, and how many
  * witnesses each has) — as Spark `groupBy`/`agg` dataflows over TPC-H-lite
  * data from [[repro.SynthData]] at SF 0.1, i.e. millions of cells instead of
  * hundreds.
  */
object WitnessStats {

  /** Per-FD redundancy profile of `df`:
    *
    *  - `fd`               rendered `lhs -> rhs`
    *  - `holds`            whether the FD holds (max distinct RHS per group = 1)
    *  - `n_groups`         number of distinct LHS values
    *  - `n_dup_groups`     groups of size ≥ 2
    *  - `n_nonunique_cells` RHS cells with entropy < 1 (Prop. 3.2)
    *  - `n_witness_pairs`  Σ over groups of g·(g−1) — total witness-clause count
    */
  def profile(spark: SparkSession, df: DataFrame, fds: Seq[(Seq[String], String)]): DataFrame = {
    import spark.implicits._
    val rows = fds.map { case (lhs, rhs) =>
      val g = df
        .groupBy(lhs.map(col): _*)
        .agg(count(lit(1)).as("g"), countDistinct(col(rhs)).as("d"))
        .agg(
          max(col("d")).as("max_d"),
          count(lit(1)).as("n_groups"),
          sum(when(col("g") > 1, 1L).otherwise(0L)).as("n_dup"),
          sum(when(col("g") > 1, col("g")).otherwise(0L)).as("n_nonunique"),
          sum(col("g") * (col("g") - 1)).as("n_pairs"),
        )
        .collect()(0)
      (
        s"${lhs.mkString(", ")} -> $rhs",
        g.getLong(0) <= 1L,
        g.getLong(1),
        g.getLong(2),
        g.getLong(3),
        g.getLong(4),
      )
    }
    rows.toDF("fd", "holds", "n_groups", "n_dup_groups", "n_nonunique_cells", "n_witness_pairs")
  }

  /** TPC-H-lite orders with a planted low-cardinality FD target: `o_region`
    * is derived from `o_custkey`, so `o_custkey -> o_region` holds and every
    * customer with ≥ 2 orders contributes redundant region cells — the
    * denormalisation pattern the plaque test is built to expose.
    */
  def ordersWithRegion(spark: SparkSession, sf: Double, seed: Long = 1): DataFrame =
    SynthData.orders(spark, sf, seed).withColumn("o_region", pmod(col("o_custkey"), lit(25)))

  /** Denormalised lineitem ⋈ orders: order-level attributes are repeated per
    * line item, i.e. `l_orderkey -> {o_custkey, o_orderdate, o_region}` hold
    * with one witness per extra line item of the order.
    */
  def lineitemDenorm(spark: SparkSession, sf: Double, seed: Long = 0): DataFrame = {
    val li = SynthData.lineitem(spark, sf, seed).select("l_orderkey", "l_linenumber", "l_quantity")
    val ord = ordersWithRegion(spark, sf).select("o_orderkey", "o_custkey", "o_orderdate", "o_region")
    li.join(ord, li("l_orderkey") === ord("o_orderkey")).drop("o_orderkey")
  }

  /** The planted FDs of [[lineitemDenorm]]. */
  val denormFds: Seq[(Seq[String], String)] = Seq(
    Seq("l_orderkey") -> "o_custkey",
    Seq("l_orderkey") -> "o_orderdate",
    Seq("l_orderkey") -> "o_region",
    Seq("o_custkey")  -> "o_region",
  )
}
