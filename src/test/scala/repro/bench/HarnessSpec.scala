package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.TestGraphs

class HarnessSpec extends AnyFunSuite {

  test("time measures and returns the value") {
    val t = Harness.time { (1 to 100).sum }
    assert(t.value == 5050)
    assert(t.millis >= 0)
  }

  test("runAlgo dispatches every algorithm name") {
    val g = TestGraphs.figure1
    for (algo <- Seq("DARC-DV", "BUR", "BUR+", "TDB", "TDB+", "TDB++")) {
      Harness.runAlgo(g, algo, k = 5) match {
        case Harness.Done(size, _, _) => assert(size >= 1, algo)
        case Harness.Dnf(r)           => fail(s"$algo DNF: $r")
      }
    }
  }

  test("runAlgo rejects unknown algorithms") {
    intercept[IllegalArgumentException] {
      Harness.runAlgo(TestGraphs.triangle, "NOPE", 3)
    }
  }

  test("DARC-DV arc explosion surfaces as DNF") {
    val g = TestGraphs.random(20, 100, seed = 1)
    // run via outcomeOf with an impossible budget
    val o = Harness.outcomeOf(repro.darc.DarcDV.cover(g, 5, maxArcs = 1))
    assert(o.isInstanceOf[Harness.Dnf])
  }

  test("fmtCell renders sizes and DNFs") {
    assert(Harness.fmtCell(Harness.Done(12, 1500, Map.empty)) == ("12", "1.50"))
    assert(Harness.fmtCell(Harness.Dnf("too big")) == ("-", "-"))
  }

  test("table renders aligned rows") {
    val t = Harness.table(Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    val lines = t.linesIterator.toSeq
    assert(lines.length == 4)
    assert(lines.map(_.length).distinct.size == 1) // all same width
  }
}
