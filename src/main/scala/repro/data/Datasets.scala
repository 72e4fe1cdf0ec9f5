package repro.data

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

import scala.jdk.CollectionConverters._

/** Synthetic stand-ins for the paper's five evaluation datasets, plus the
  * CD-collection running example of Figure 1.
  *
  * The sealed build environment has no copy of the WDC/UCI/HPI datasets, so
  * each generator reproduces the *redundancy structure* the paper reports for
  * its dataset (row/column counts, which columns carry plaque, constant
  * columns, bijective column pairs, duplicate-group sizes). The plaque test
  * only observes value equality and FDs, so these mimics exercise identical
  * code paths; DESIGN.md §3 documents the substitution.
  *
  * All generators are deterministic (pure functions of the row index) and
  * carry an `id` column fixing the tuple order of the paper's ordered
  * instance model.
  */
object Datasets {

  /** Row counts matching the paper's "rows analyzed". */
  val RowCounts: Map[String, Int] = Map(
    "satellites"     -> 150,
    "adult"          -> 150,
    "echocardiogram" -> 132,
    "ncvoter"        -> 150,
    "iris"           -> 150,
  )

  private def build(spark: SparkSession, n: Int, cols: Seq[(String, Int => Any)]): DataFrame = {
    val schema = StructType(
      StructField("id", LongType, nullable = false) +:
        cols.map { case (name, _) => StructField(name, StringType, nullable = false) }
    )
    val rows: Seq[Row] =
      (0 until n).map(j => Row.fromSeq(j.toLong +: cols.map { case (_, f) => f(j).toString }))
    spark.createDataFrame(rows.asJava, schema)
  }

  /** The CD-collection relation of Figure 1a (verbatim). */
  def cdCollection(spark: SparkSession): DataFrame = {
    val data = Seq(
      (1, "Not That Kind", "Anastacia", 1999, 2000, 1, "Not That Kind"),
      (1, "Not That Kind", "Anastacia", 1999, 2000, 2, "I'm Outta Love"),
      (1, "Not That Kind", "Anastacia", 1999, 2000, 3, "Cowboys"),
      (2, "Wish You Were Here", "Pink Floyd", 1965, 1975, 1, "Shine On You"),
      (3, "Freak of Nature", "Anastacia", 1999, 2001, 1, "Paid my Dues"),
    )
    build(spark, data.size, Seq(
      "cd_id" -> (j => data(j)._1),
      "album" -> (j => data(j)._2),
      "band"  -> (j => data(j)._3),
      "byear" -> (j => data(j)._4),
      "ryear" -> (j => data(j)._5),
      "track" -> (j => data(j)._6),
      "title" -> (j => data(j)._7),
    ))
  }

  /** The six genuine FDs of Example 1.1 (name-level, against
    * [[cdCollection]]'s columns).
    */
  val cdGenuineFds: Seq[(Seq[String], String)] = Seq(
    Seq("cd_id") -> "album",
    Seq("cd_id") -> "band",
    Seq("cd_id") -> "byear",
    Seq("cd_id") -> "ryear",
    Seq("band")  -> "byear",
    Seq("cd_id", "track") -> "title",
  )

  // --- satellites -----------------------------------------------------------

  /** Per-row (mean_radius, planet) assignment for the satellites mimic.
    *
    * 35 rows carry globally unique radii; the other 115 fall into duplicate
    * groups sharing a radius (and hence a planet — the planted FD
    * `mean_radius -> planet`), including one size-8 group ("radius 3.0", all
    * Saturn) that produces the dataset's minimum entropy (paper: ≈ 0.6).
    *
    * The *prefix* layout is tuned to reproduce Table 1's runtime shape: row 0
    * is unique (1-2 rows are trivially redundancy-free), a size-2 group is
    * split around a size-3 group over rows 1-5 (the optimized exact run stays
    * fast through 4 rows, slows at 5 and aborts at 6, like the paper's 24-h
    * budget), and the size-8 Saturn group follows at rows 6-13.
    */
  private val satAssignment: Vector[(String, String)] = {
    val planets = Vector("Jupiter", "Saturn", "Uranus", "Neptune")
    val buf = scala.collection.mutable.ArrayBuffer.empty[(String, String)]
    buf += (("u0.25", planets(2)))                  // row 0: unique
    buf += (("rA.5", "Jupiter"))                    // rows 1, 5: size-2 group
    buf ++= Vector.fill(3)(("rB.5", "Uranus"))      // rows 2-4: size-3 group
    buf += (("rA.5", "Jupiter"))
    buf ++= Vector.fill(8)(("3.0", "Saturn"))       // rows 6-13: the zoom-in group
    // Rows 14-115: 102 more grouped rows, sizes cycling 4,5,2,3.
    val sizes = Vector.fill(7)(Vector(4, 5, 2, 3)).flatten :+ 4
    for ((size, i) <- sizes.zipWithIndex) {
      val g = i + 2
      buf ++= Vector.fill(size)((s"r$g.5", planets(g % planets.length)))
    }
    // Rows 116-149: 34 more unique radii.
    for (u <- 1 until 35) buf += ((s"u$u.25", planets((u + 2) % planets.length)))
    require(buf.size == 150, s"satellite layout has ${buf.size} rows")
    buf.toVector
  }

  /** Satellites mimic (WDC Web Table Corpus stand-in): 150 rows × 8 columns.
    *
    * Redundancy structure: `mean_radius -> planet` with the group layout
    * above (planet column carries nearly all plaque); `discovered_by ->
    * notes` on two planted pairs (rows 30/35 and 80/95 — rows in different
    * radius groups with different planets, so no other FD holds on them —
    * the "very few cells in Notes"; placing them on already-grouped rows
    * keeps the paper's count of 35 redundancy-free rows exact); rows 140/141
    * reuse the duplicated notes with a unique discoverer, so the reverse FD
    * `notes -> discovered_by` fails and plaque stays out of the discoverer
    * column. `name`/`year`/`orbit_class`/`designation` are keys (their FDs
    * have only singleton groups and generate no plaque).
    */
  def satellites(spark: SparkSession): DataFrame = build(spark, 150, Seq(
    "name"          -> (j => s"S$j"),
    "planet"        -> (j => satAssignment(j)._2),
    "mean_radius"   -> (j => satAssignment(j)._1),
    "discovered_by" -> (j => j match {
      case 30 | 35 => "dupD"
      case 80 | 95 => "dupE"
      case _       => s"D$j"
    }),
    "year"          -> (j => (1610 + j).toString),
    "notes"         -> (j => j match {
      case 30 | 35 | 140 => "irregular"
      case 80 | 95 | 141 => "shepherd"
      case _             => s"note$j"
    }),
    "orbit_class"   -> (j => s"O$j"),
    "designation"   -> (j => s"1900 X$j"),
  ))

  // --- adult ----------------------------------------------------------------

  /** Adult/census mimic: 150 rows × 15 columns. `education` and
    * `education_num` form the paper's bijection (cyclic FDs both ways, equal
    * per-row entropies); every other column is a key or collision-free, so
    * exactly those two columns carry plaque.
    */
  def adult(spark: SparkSession): DataFrame = build(spark, 150, Seq(
    "age"            -> (j => (17 + (j * 13) % 60).toString),
    "workclass"      -> (j => s"W$j"),
    "fnlwgt"         -> (j => (10000 + j * 37).toString),
    "education"      -> (j => s"E${j % 16}"),
    "education_num"  -> (j => (j % 16).toString),
    "marital_status" -> (j => s"M$j"),
    "occupation"     -> (j => s"Occ$j"),
    "relationship"   -> (j => s"R$j"),
    "race"           -> (j => s"Ra$j"),
    "sex"            -> (j => s"Sx$j"),
    "capital_gain"   -> (j => (j * 91).toString),
    "capital_loss"   -> (j => (j * 53 + 7).toString),
    "hours_per_week" -> (j => (j + 200).toString),
    "native_country" -> (j => s"C$j"),
    "income"         -> (j => s"I$j"),
  ))

  // --- echocardiogram -------------------------------------------------------

  private def perm4(v: Int): Int = Vector(2, 0, 3, 1)(v)
  private def perm6(v: Int): Int = Vector(4, 2, 5, 0, 3, 1)(v)

  /** Echocardiogram mimic: 132 rows × 13 columns.
    *
    * `name` is the anonymised constant column (every attribute functionally
    * determines it; entropies ≈ 0 — the paper's "almost no informational
    * value" column). Three bijective low-cardinality pairs
    * (`group/group_code`, `wall_score/wall_index`, `site/site_code`) both
    * feed the `name` clauses and carry plaque themselves; two near-unique
    * bidirectionally-planted pairs (`survival/still_alive`,
    * `age/fractional`) carry sparse plaque; `mult` and `alive_at_1` stay
    * white — 11 of 13 columns colored, as in the paper.
    */
  def echocardiogram(spark: SparkSession): DataFrame = build(spark, 132, Seq(
    "name"       -> (_ => "anonymous"),
    "group"      -> (j => (j % 4).toString),
    "group_code" -> (j => s"g${perm4(j % 4)}"),
    "wall_score" -> (j => ((j / 4) % 4 + 5).toString),
    "wall_index" -> (j => s"w${perm4((j / 4) % 4)}"),
    "site"       -> (j => ((j * 7) % 6).toString),
    "site_code"  -> (j => s"s${perm6((j * 7) % 6)}"),
    "survival"   -> (j => j match { // bidirectional planted pair with `still_alive`
      case 20 | 21 => "surv_dup"
      case _       => (j * 31 % 997).toString
    }),
    "still_alive" -> (j => j match {
      case 20 | 21 => "sa_dup"
      case _       => s"sa$j"
    }),
    "age"        -> (j => j match { // bidirectional planted pair with `fractional`
      case 60 | 61 => "age_dup"
      case _       => (300 + j).toString
    }),
    "fractional" -> (j => j match {
      case 60 | 61 => "fr_dup"
      case _       => s"f$j"
    }),
    "mult"       -> (j => s"m$j"),
    "alive_at_1" -> (j => s"a$j"),
  ))

  // --- ncvoter --------------------------------------------------------------

  private def perm10(v: Int): Int = Vector(7, 3, 9, 0, 5, 1, 8, 2, 6, 4)(v)
  private def perm12(v: Int): Int = Vector(5, 11, 0, 7, 2, 9, 4, 1, 10, 3, 8, 6)(v)

  /** NCVoter mimic: 150 rows × 19 columns.
    *
    * `state` is constant (all voters are in North Carolina — zero information
    * content, as the paper observes). Bijective pairs `county/county_id` and
    * `city/zip` plus five bidirectionally-planted near-unique pairs put
    * sparse plaque in 15 of 19 columns; `party`, `gender`, `status`,
    * `precinct` stay white (no FD has them on the RHS).
    */
  def ncvoter(spark: SparkSession): DataFrame = {
    // A bidirectionally planted pair: both rows share the value in both
    // columns of the pair, nothing else — yields the cyclic FDs col1 <-> col2
    // restricted to that duplicate group (two plaque cells per column).
    def planted(a: Int, b: Int, dup: String, base: Int => String): Int => String =
      j => if (j == a || j == b) dup else base(j)
    build(spark, 150, Seq(
      "state"      -> (_ => "NC"),
      "county"     -> (j => s"County${j % 10}"),
      "county_id"  -> (j => perm10(j % 10).toString),
      "city"       -> (j => s"City${(j * 5) % 12}"),
      "zip"        -> (j => (27000 + perm12((j * 5) % 12)).toString),
      "name_first" -> (j => planted(12, 13, "James", i => s"fn$i")(j)),
      "name_suffix"-> (j => planted(12, 13, "Jr", i => s"sfx$i")(j)),
      "name_last"  -> (j => planted(30, 31, "Smith", i => s"ln$i")(j)),
      "name_title" -> (j => planted(30, 31, "Dr", i => s"ttl$i")(j)),
      "street"     -> (j => planted(50, 51, "1 Main St", i => s"st$i")(j)),
      "unit"       -> (j => planted(50, 51, "Apt 1", i => s"u$i")(j)),
      "reg_date"   -> (j => planted(70, 71, "2001-02-03", i => s"rd$i")(j)),
      "reg_office" -> (j => planted(70, 71, "Office7", i => s"ro$i")(j)),
      "birth_year" -> (j => planted(90, 91, "1960", i => s"by${1700 + i}")(j)),
      "age_group"  -> (j => planted(90, 91, "60+", i => s"ag$i")(j)),
      "party"      -> (j => s"P${(j + j / 10) % 5}"),
      "gender"     -> (j => s"G${(j + j / 12) % 3}"),
      "status"     -> (j => s"A${(j + j / 8) % 4}"),
      "precinct"   -> (j => s"PR${(j + j / 4) % 30}"),
    ))
  }

  // --- iris -----------------------------------------------------------------

  /** Iris mimic: 150 rows × 5 columns, 50 rows per class. `petal_length` and
    * `petal_width` take class-disjoint duplicated values (so each determines
    * `class`), sepal measurements overlap across classes, and the petal-length
    * blocks are shifted by 3 rows against the petal-width blocks so neither
    * petal column determines the other — with unary discovery every FD has
    * `class` on the RHS and only the class column shows plaque, as in the
    * paper (which reports 4 FDs, all with `class` on the right).
    */
  def iris(spark: SparkSession): DataFrame = build(spark, 150, Seq(
    "sepal_length" -> (j => (40 + (j * 11) % 37).toString),
    "sepal_width"  -> (j => (20 + (j * 17) % 23).toString),
    "petal_length" -> (j => (10 * (j / 50) + ((j % 50 + 3) / 5) % 10).toString),
    "petal_width"  -> (j => (100 + 20 * (j / 50) + (j % 50) / 10).toString),
    "class"        -> (j => Vector("setosa", "versicolor", "virginica")(j / 50)),
  ))

  /** All five mimics keyed by the paper's dataset name. */
  def byName(spark: SparkSession): Map[String, DataFrame] = Map(
    "satellites"     -> satellites(spark),
    "adult"          -> adult(spark),
    "echocardiogram" -> echocardiogram(spark),
    "ncvoter"        -> ncvoter(spark),
    "iris"           -> iris(spark),
  )
}
