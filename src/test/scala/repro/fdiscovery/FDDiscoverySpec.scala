package repro.fdiscovery

import org.scalatest.funsuite.AnyFunSuite

import repro.{Oracle, SparkSpec}
import repro.core._
import repro.data.Datasets

class FDDiscoverySpec extends AnyFunSuite with SparkSpec {

  private val ex34 = Instance(
    Vector("A", "B", "C", "D"),
    Vector(Vector(7, 2, 8, 4), Vector(5, 2, 8, 6), Vector(7, 2, 8, 6)),
  )

  test("holdsLocal on Example 3.4") {
    assert(FDDiscovery.holdsLocal(ex34, Set(0), 2))  // A -> C
    assert(FDDiscovery.holdsLocal(ex34, Set(0), 1))  // A -> B (B constant)
    assert(!FDDiscovery.holdsLocal(ex34, Set(1), 0)) // B -> A
    assert(!FDDiscovery.holdsLocal(ex34, Set(0), 3)) // A -> D
    assert(FDDiscovery.holdsLocal(ex34, Set(0, 3), 2))
  }

  test("holdsLocal on trivial FDs") {
    assert(FDDiscovery.holdsLocal(ex34, Set(2), 2))
    assert(FDDiscovery.holdsLocal(ex34, Set(1, 2), 2))
  }

  test("discoverLocal finds A -> C on Example 3.4") {
    val fds = FDDiscovery.discoverLocal(ex34, maxLhs = 1)
    assert(fds.contains(FD(Set(0), 2)))
  }

  test("discoverLocal reports constant columns as determined by every attribute") {
    val fds = FDDiscovery.discoverLocal(ex34, maxLhs = 1)
    // B is constant: A->B, C->B, D->B all hold.
    assert(fds.count(_.rhs == 1) == 3)
  }

  test("discoverLocal is minimal: no FD has a determining proper subset") {
    val fds = FDDiscovery.discoverLocal(ex34, maxLhs = 2)
    for (f <- fds; sub <- f.lhs.subsets if sub.size < f.lhs.size && sub.nonEmpty)
      assert(!FDDiscovery.holdsLocal(ex34, sub, f.rhs), s"$f has determining subset $sub")
  }

  test("every discovered FD actually holds (maxLhs=2, Example 3.4)") {
    val fds = FDDiscovery.discoverLocal(ex34, maxLhs = 2)
    for (f <- fds) assert(Fulfills.holds(ex34, f), s"$f")
  }

  test("discovery on the CD example finds the genuine unary FDs") {
    val inst = Instance.fromDataFrame(Datasets.cdCollection(spark), "id")
    val fds = FDDiscovery.discoverLocal(inst, maxLhs = 1)
    val id = inst.attrIndex("cd_id")
    for (rhs <- Seq("album", "band", "byear", "ryear"))
      assert(fds.contains(FD(Set(id), inst.attrIndex(rhs))), s"cd_id -> $rhs missing")
    assert(fds.contains(FD(Set(inst.attrIndex("band")), inst.attrIndex("byear"))))
    assert(fds.contains(FD(Set(inst.attrIndex("byear")), inst.attrIndex("band"))))
  }

  test("discovery on the CD example finds (cd_id, track) -> title at level 2") {
    val inst = Instance.fromDataFrame(Datasets.cdCollection(spark), "id")
    val fds = FDDiscovery.discoverLocal(inst, maxLhs = 2)
    val f = FD(Set(inst.attrIndex("cd_id"), inst.attrIndex("track")), inst.attrIndex("title"))
    assert(fds.contains(f))
  }

  test("level-2 candidates exclude supersets of level-1 FDs (minimality)") {
    val inst = Instance.fromDataFrame(Datasets.cdCollection(spark), "id")
    val fds = FDDiscovery.discoverLocal(inst, maxLhs = 2)
    val id = inst.attrIndex("cd_id")
    val album = inst.attrIndex("album")
    // cd_id -> album holds, so {cd_id, X} -> album must not be reported.
    assert(!fds.exists(f => f.rhs == album && f.lhs.size == 2 && f.lhs.contains(id)))
  }

  test("discover returns the same FDs as discoverLocal on the encoded instance") {
    val df = Datasets.cdCollection(spark)
    val (inst, fds) = FDDiscovery.discover(df, "id", maxLhs = 1)
    assert(fds == FDDiscovery.discoverLocal(inst, maxLhs = 1))
  }

  test("byNames renders FDs with attribute names") {
    val fds = Vector(FD(Set(0), 2))
    assert(FDDiscovery.byNames(ex34, fds) == Vector((Seq("A"), "C")))
  }

  // --- distributed paths ----------------------------------------------------

  private lazy val satDf = Datasets.satellites(spark).cache()

  test("holdsSpark agrees with holdsLocal on the satellites mimic") {
    val inst = Instance.fromDataFrame(satDf, "id")
    val cases = Seq(
      (Seq("mean_radius"), "planet"),
      (Seq("planet"), "mean_radius"),
      (Seq("discovered_by"), "notes"),
      (Seq("notes"), "discovered_by"),
      (Seq("name"), "planet"),
      (Seq("planet", "discovered_by"), "mean_radius"),
    )
    for ((lhs, rhs) <- cases) {
      val local = FDDiscovery.holdsLocal(inst, lhs.map(inst.attrIndex).toSet, inst.attrIndex(rhs))
      val dist = FDDiscovery.holdsSpark(satDf, lhs, rhs)
      assert(local == dist, s"$lhs -> $rhs: local=$local spark=$dist")
    }
  }

  test("holdsSpark agrees with a DuckDB group-count check") {
    // Verify the groupBy/countDistinct dataflow itself against DuckDB.
    val counts = satDf
      .groupBy("mean_radius")
      .agg(org.apache.spark.sql.functions.expr("cast(count(distinct planet) as string) as d"))
    Oracle.assertEquivalent(
      counts,
      "SELECT mean_radius, CAST(COUNT(DISTINCT planet) AS VARCHAR) AS d FROM sat GROUP BY mean_radius",
      "sat" -> satDf,
    )
  }

  test("discoverSparkUnary equals local unary discovery on satellites") {
    val inst = Instance.fromDataFrame(satDf, "id")
    val localUnary = FDDiscovery
      .discoverLocal(inst, maxLhs = 1)
      .map(f => (f.lhs.toSeq.sorted.map(inst.attrs), inst.attrs(f.rhs)))
      .toSet
    val sparkUnary = FDDiscovery.discoverSparkUnary(satDf, exclude = Set("id")).toSet
    assert(sparkUnary == localUnary)
  }

  test("discoverSparkUnary on the CD example matches local unary discovery") {
    val df = Datasets.cdCollection(spark)
    val inst = Instance.fromDataFrame(df, "id")
    val localUnary = FDDiscovery
      .discoverLocal(inst, maxLhs = 1)
      .map(f => (f.lhs.toSeq.sorted.map(inst.attrs), inst.attrs(f.rhs)))
      .toSet
    assert(FDDiscovery.discoverSparkUnary(df, exclude = Set("id")).toSet == localUnary)
  }
}
