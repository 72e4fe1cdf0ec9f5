package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

/** End-to-end "plaque test": per-cell entropy matrix for a relation instance
  * under a set of functional dependencies (the paper's visualization input).
  *
  * Pipeline = closure (§2.1) → Prop. 3.2 uniqueness skip → witness clauses on
  * the reduced problem (§3.1) → Spark-distributed Monte-Carlo estimation
  * (§3.2) for the remaining positions.
  */
object PlaqueTest {

  /** Entropy matrix plus the artefacts needed by the benchmarks.
    *
    * @param inst       the analyzed instance
    * @param entropies  `entropies(row)(col)` — 1.0 for unique cells
    * @param nonUnique  positions with entropy < 1 (Prop. 3.2 complement)
    * @param closedFds  the FD closure actually used
    * @param iterations MC iterations per non-unique cell (0 = exact)
    */
  final case class Result(
      inst: Instance,
      entropies: Vector[Vector[Double]],
      nonUnique: Set[Pos],
      closedFds: Vector[FD],
      iterations: Long,
  ) {
    def entropy(p: Pos): Double = entropies(p.row)(p.col)

    def cells: Int = inst.nCells

    /** Smallest entropy in the matrix (1.0 for a redundancy-free instance). */
    def minEntropy: Double =
      entropies.iterator.flatMap(_.iterator).foldLeft(1.0)(math.min)

    /** Fraction of cells with entropy exactly 1 (Fig. 4's headline). */
    def fractionOnes: Double = {
      val ones = entropies.iterator.flatMap(_.iterator).count(_ >= 1.0)
      ones.toDouble / cells
    }

    /** Attribute names with at least one cell below 1 ("columns with
      * plaque"; RQ1 reports these per dataset).
      */
    def plaqueColumns: Vector[String] =
      inst.attrs.indices.filter(k => entropies.exists(row => row(k) < 1.0)).map(inst.attrs).toVector

    /** Attribute names whose cells are all (approximately) zero entropy —
      * the "no informational value" columns of echocardiogram/NCVoter.
      */
    def zeroColumns(tol: Double = 0.05): Vector[String] =
      inst.attrs.indices
        .filter(k => entropies.forall(row => row(k) <= tol))
        .map(inst.attrs)
        .toVector

    /** Histogram over entropy values: bucket i covers
      * `[i*width, (i+1)*width)`, the last bucket additionally includes 1.0.
      */
    def histogram(width: Double = 0.05): Vector[(Double, Int)] = {
      val nBuckets = math.ceil(1.0 / width).toInt
      val counts = new Array[Int](nBuckets)
      for (row <- entropies; e <- row) {
        val b = math.min(nBuckets - 1, (e / width).toInt)
        counts(b) += 1
      }
      Vector.tabulate(nBuckets)(i => (i * width, counts(i)))
    }

    /** Long-format DataFrame `(row_id, attr, entropy)` for downstream SQL. */
    def toDF(spark: SparkSession): DataFrame = {
      import spark.implicits._
      val rows = for {
        j <- inst.rows.indices
        k <- inst.attrs.indices
      } yield (j.toLong, inst.attrs(k), entropies(j)(k))
      rows.toDF("row_id", "attr", "entropy")
    }
  }

  /** Run the plaque test with Spark-distributed Monte Carlo.
    *
    * @param fds        the FD set `F` (closure is computed internally)
    * @param iterations MC iterations per non-unique cell
    */
  def run(
      spark: SparkSession,
      inst: Instance,
      fds: Seq[FD],
      iterations: Long,
      seed: Long = 42,
      maxLhsClosure: Int = Int.MaxValue,
  ): Result = {
    val closed = FDs.closure(fds, maxLhsClosure)
    val clauses = Clauses.forAllPositions(inst, closed).filter(_._2.nonEmpty)
    val est = MonteCarlo.estimateSpark(spark, clauses.view.mapValues(v => v: Seq[Set[Pos]]).toMap, iterations, seed)
    assemble(inst, closed, est, iterations)
  }

  /** Run the plaque test with *exact* clause-based entropies (small problems
    * and tests only).
    */
  def runExact(inst: Instance, fds: Seq[FD], maxVars: Int = 26): Result = {
    val closed = FDs.closure(fds)
    val clauses = Clauses.forAllPositions(inst, closed).filter(_._2.nonEmpty)
    val exact = clauses.map { case (p, cls) => p -> ExactEntropy.viaClauses(cls, maxVars) }
    assemble(inst, closed, exact, 0L)
  }

  /** Convenience entry point from a DataFrame with name-level FDs. */
  def fromDataFrame(
      spark: SparkSession,
      df: DataFrame,
      orderBy: String,
      fds: Seq[(Seq[String], String)],
      iterations: Long,
      seed: Long = 42,
  ): Result = {
    val inst = Instance.fromDataFrame(df, orderBy)
    run(spark, inst, FDs.byName(inst.attrs, fds), iterations, seed)
  }

  private def assemble(
      inst: Instance,
      closed: Vector[FD],
      below: Map[Pos, Double],
      iterations: Long,
  ): Result = {
    val matrix = Vector.tabulate(inst.nRows, inst.arity) { (j, k) =>
      below.getOrElse(Pos(j, k), 1.0)
    }
    Result(inst, matrix, below.keySet, closed, iterations)
  }
}
