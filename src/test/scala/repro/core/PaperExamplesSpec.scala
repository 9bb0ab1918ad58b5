package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.TestGraphs

/** Scenarios lifted directly from the paper's running examples. */
class PaperExamplesSpec extends AnyFunSuite {

  test("Figure 1: {a} covers all three hop<=5 cycles and is minimal") {
    val g = TestGraphs.figure1 // a = vertex 0
    assert(CoverValidator.isValid(g, 5, 3, Array(0L)))
    assert(CoverValidator.isMinimal(g, 5, 3, Array(0L)))
  }

  test("Figure 1: BUR's hit-count heuristic selects the shared hub a") {
    val res = BottomUp.cover(TestGraphs.figure1, 5)
    assert(res.cover.toSeq == Seq(0L)) // first cycle's tie resolves to a,
    // whose removal kills the remaining cycles — optimum size 1
  }

  test("Theorem 1: covering simple cycles covers non-simple circuits too") {
    // Graph with a non-simple closed walk 0->1->2->0->3->4->0 decomposable
    // into two triangles; any cover of the two simple triangles also breaks
    // the walk (it passes through both).
    val g = TestGraphs.bowTie
    val cover = TopDown.cover(g, 6).cover
    assert(CoverValidator.isValid(g, 6, 3, cover))
    val coverSet = cover.toSet
    val walk = Seq(0L, 1L, 2L, 0L, 3L, 4L)
    assert(walk.exists(coverSet.contains))
  }

  test("Example 1 motivation: centre vertex accumulates hit counts") {
    // Star of triangles through centre C(=0): after the first cycle is
    // covered elsewhere, C's hit count raises it to the top pick.
    val g = TestGraphs.fromPairs(
      (1, 2), (2, 0), (0, 1),
      (3, 4), (4, 0), (0, 3),
      (5, 6), (6, 0), (0, 5))
    val res = BottomUp.cover(g, 5)
    assert(CoverValidator.isValid(g, 5, 3, res.cover))
    assert(res.cover.length <= 2) // hub-centric: near-optimal
  }

  test("paper's constraint setting: self-loops never influence covers") {
    val withLoop = DirectedGraph.fromEdges(Seq((0L, 0L), (0L, 1L), (1L, 2L), (2L, 0L)))
    val without = DirectedGraph.fromEdges(Seq((0L, 1L), (1L, 2L), (2L, 0L)))
    assert(TopDown.cover(withLoop, 5).cover.toSeq == TopDown.cover(without, 5).cover.toSeq)
  }

  test("2-cycles excluded: Table IV's ratio premise (with >= without)") {
    val g = TestGraphs.random(25, 120, seed = 4242)
    val no2 = TopDown.cover(g, 5, minLen = 3).size
    val with2 = TopDown.cover(g, 5, minLen = 2).size
    assert(with2 >= no2)
  }
}
