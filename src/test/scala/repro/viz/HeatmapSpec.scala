package repro.viz

import org.scalatest.funsuite.AnyFunSuite

import repro.core._

class HeatmapSpec extends AnyFunSuite {

  private val ex34 = Instance(
    Vector("A", "B", "C", "D"),
    Vector(Vector(7, 2, 8, 4), Vector(5, 2, 8, 6), Vector(7, 2, 8, 6)),
  )
  private lazy val res = PlaqueTest.runExact(ex34, Vector(FD(Set(0), 2)))

  test("intensity is 0 at entropy 1") {
    assert(Heatmap.intensity(1.0, 0.5) == 0.0)
  }

  test("intensity is 1 at the minimum entropy") {
    assert(Heatmap.intensity(0.5, 0.5) == 1.0)
  }

  test("intensity scales linearly between min and 1") {
    assert(math.abs(Heatmap.intensity(0.75, 0.5) - 0.5) < 1e-12)
  }

  test("intensity of an all-white table is 0 everywhere") {
    assert(Heatmap.intensity(1.0, 1.0) == 0.0)
    assert(Heatmap.intensity(0.999999, 1.0) == 0.0) // minE >= 1 guard
  }

  test("intensity rejects out-of-range entropies") {
    assertThrows[IllegalArgumentException](Heatmap.intensity(1.5, 0.5))
    assertThrows[IllegalArgumentException](Heatmap.intensity(-0.1, 0.5))
  }

  test("shade maps 0 to blank and 1 to the deepest glyph") {
    assert(Heatmap.shade(0.0) == ' ')
    assert(Heatmap.shade(1.0) == '@')
  }

  test("shade is monotone") {
    val shades = (0 to 10).map(i => Heatmap.Ramp.indexOf(Heatmap.shade(i / 10.0)))
    assert(shades == shades.sorted)
  }

  test("render produces one line per tuple plus a header") {
    val out = Heatmap.render(res).split("\n")
    assert(out.length == 1 + ex34.nRows)
    assert(out.head == "ABCD")
  }

  test("render marks exactly the plaque cells") {
    val out = Heatmap.render(res).split("\n").drop(1)
    // Cells (0,C) and (2,C) carry the deepest shade; everything else blank.
    assert(out(0) == "  @ ")
    assert(out(1) == "    ")
    assert(out(2) == "  @ ")
  }

  test("csv lists every cell with entropy and intensity") {
    val lines = Heatmap.csv(res).split("\n")
    assert(lines.head == "row,attr,entropy,intensity")
    assert(lines.length == 1 + ex34.nCells)
    assert(lines.exists(_.startsWith("0,C,0.8750,1.0000")))
    assert(lines.exists(_.startsWith("1,C,1.0000,0.0000")))
  }
}
