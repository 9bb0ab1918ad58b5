package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.TestGraphs

class CoverValidatorSpec extends AnyFunSuite {

  test("empty cover of a DAG is valid and minimal") {
    assert(CoverValidator.isValid(TestGraphs.dag, 5, 3, Array.empty))
    assert(CoverValidator.isMinimal(TestGraphs.dag, 5, 3, Array.empty))
  }

  test("empty cover of a triangle is invalid") {
    assert(!CoverValidator.isValid(TestGraphs.triangle, 3, 3, Array.empty))
  }

  test("full cover of a triangle is valid but not minimal") {
    val full = Array(0L, 1L, 2L)
    assert(CoverValidator.isValid(TestGraphs.triangle, 3, 3, full))
    assert(!CoverValidator.isMinimal(TestGraphs.triangle, 3, 3, full))
  }

  test("single-vertex cover of a triangle is valid and minimal") {
    assert(CoverValidator.isValid(TestGraphs.triangle, 3, 3, Array(1L)))
    assert(CoverValidator.isMinimal(TestGraphs.triangle, 3, 3, Array(1L)))
  }

  test("a vertex off every cycle breaks minimality") {
    val g = TestGraphs.fromPairs((0, 1), (1, 2), (2, 0), (2, 3)) // 3 is a sink
    assert(CoverValidator.isValid(g, 5, 3, Array(0L, 3L)))
    assert(!CoverValidator.isMinimal(g, 5, 3, Array(0L, 3L)))
  }

  test("fast and slow paths agree on bowTie covers") {
    val g = TestGraphs.bowTie
    for (cover <- Seq(Array(0L), Array(1L, 3L), Array(1L), Array.empty[Long])) {
      assert(CoverValidator.isValid(g, 5, 3, cover, fast = true) ==
             CoverValidator.isValid(g, 5, 3, cover, fast = false), cover.mkString(","))
    }
  }

  test("validity respects the hop constraint") {
    val g = TestGraphs.fromPairs((0, 1), (1, 2), (2, 3), (3, 4), (4, 0))
    assert(CoverValidator.isValid(g, 4, 3, Array.empty))  // 5-cycle invisible at k=4
    assert(!CoverValidator.isValid(g, 5, 3, Array.empty))
  }

  test("minLen=2 validity counts 2-cycles") {
    val g = TestGraphs.twoCycle
    assert(CoverValidator.isValid(g, 5, 3, Array.empty))
    assert(!CoverValidator.isValid(g, 5, 2, Array.empty))
    assert(CoverValidator.isValid(g, 5, 2, Array(0L)))
  }
}
