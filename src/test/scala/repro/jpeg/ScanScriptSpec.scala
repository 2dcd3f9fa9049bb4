package repro.jpeg

import org.scalatest.funsuite.AnyFunSuite

class ScanScriptSpec extends AnyFunSuite {

  test("the default progressive script has 10 scans") {
    assert(ScanScript.progressive10.length == 10)
  }

  test("the default progressive script is valid and complete") {
    assert(ScanScript.isComplete(ScanScript.progressive10, 3))
  }

  test("every prefix of the default script is valid") {
    for (g <- 1 to 10) {
      ScanScript.finalDepths(ScanScript.progressive10.take(g), 3) // must not throw
    }
  }

  test("scan 1 carries only coarse DC; scan 10 finishes luma AC") {
    val s1 = ScanScript.progressive10.head
    assert(s1.coversDc && s1.ss == 0 && s1.se == 0 && s1.al == 1)
    val s10 = ScanScript.progressive10.last
    assert(s10.components == Seq(0) && s10.ss == 1 && s10.se == 63 && s10.al == 0)
  }

  test("sequential scripts are complete for any component count") {
    for (nc <- 1 to 3) {
      val s = ScanScript.sequential(nc)
      assert(s.length == nc)
      assert(ScanScript.isComplete(s, nc))
    }
  }

  test("a script that re-sends a coefficient is rejected") {
    val bad = Vector(
      ScanSpec(Seq(0), 0, 63, 0, 0),
      ScanSpec(Seq(0), 1, 5, 0, 0))
    assertThrows[IllegalArgumentException](ScanScript.finalDepths(bad, 1))
  }

  test("a refinement over never-sent coefficients is rejected") {
    val bad = Vector(ScanSpec(Seq(0), 1, 5, 1, 0))
    assertThrows[IllegalArgumentException](ScanScript.finalDepths(bad, 1))
  }

  test("a refinement at the wrong depth is rejected") {
    val bad = Vector(
      ScanSpec(Seq(0), 1, 5, 0, 2),
      ScanSpec(Seq(0), 1, 5, 1, 0)) // ah=1 but coefficients sit at depth 2
    assertThrows[IllegalArgumentException](ScanScript.finalDepths(bad, 1))
  }

  test("a scan referencing a missing component is rejected") {
    val bad = Vector(ScanSpec(Seq(2), 0, 0, 0, 0))
    assertThrows[IllegalArgumentException](ScanScript.finalDepths(bad, 1))
  }

  test("an incomplete script is reported as such") {
    val partial = Vector(ScanSpec(Seq(0), 0, 0, 0, 1))
    assert(!ScanScript.isComplete(partial, 1))
  }

  test("ScanSpec invariants") {
    assertThrows[IllegalArgumentException](ScanSpec(Seq.empty, 0, 0, 0, 0))
    assertThrows[IllegalArgumentException](ScanSpec(Seq(0), 5, 3, 0, 0))  // ss > se
    assertThrows[IllegalArgumentException](ScanSpec(Seq(0), 0, 64, 0, 0)) // out of band
    assertThrows[IllegalArgumentException](ScanSpec(Seq(0), 1, 5, 3, 1))  // ah != al+1
  }
}
