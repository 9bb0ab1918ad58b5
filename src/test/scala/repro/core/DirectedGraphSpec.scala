package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.TestGraphs

class DirectedGraphSpec extends AnyFunSuite {

  test("triangle has 3 vertices and 3 edges") {
    val g = TestGraphs.triangle
    assert(g.n == 3)
    assert(g.m == 3)
  }

  test("self-loops are dropped at construction") {
    val g = DirectedGraph.fromInternal(3, Array((0, 0), (0, 1), (1, 2), (2, 2)))
    assert(g.m == 2)
    assert(!g.hasEdge(0, 0))
  }

  test("parallel edges are deduplicated") {
    val g = DirectedGraph.fromInternal(2, Array((0, 1), (0, 1), (0, 1)))
    assert(g.m == 1)
  }

  test("bidirectional edges are kept as two directed edges") {
    val g = TestGraphs.twoCycle
    assert(g.m == 2)
    assert(g.hasEdge(0, 1) && g.hasEdge(1, 0))
  }

  test("out-degrees and in-degrees match the edge list") {
    val g = TestGraphs.bowTie
    assert(g.outDeg(0) == 2)
    assert(g.inDeg(0) == 2)
    assert(g.outDeg(1) == 1)
    assert(g.inDeg(4) == 1)
  }

  test("foreachOut visits exactly the out-neighbours") {
    val g = TestGraphs.figure1
    val buf = scala.collection.mutable.Set.empty[Int]
    g.foreachOut(0)(buf += _)
    assert(buf == Set(1, 3, 5))
  }

  test("foreachIn visits exactly the in-neighbours") {
    val g = TestGraphs.figure1
    val buf = scala.collection.mutable.Set.empty[Int]
    g.foreachIn(0)(buf += _)
    assert(buf == Set(2, 4, 7))
  }

  test("hasEdge is consistent with adjacency") {
    val g = TestGraphs.random(30, 120, seed = 1)
    for (u <- 0 until g.n; v <- 0 until g.n) {
      var found = false
      g.foreachOut(u)(w => if (w == v) found = true)
      assert(g.hasEdge(u, v) == found, s"hasEdge($u,$v)")
    }
  }

  test("sparse Long ids are remapped to dense ints, ascending") {
    val g = DirectedGraph.fromEdges(Seq((100L, 7L), (7L, 5000L), (5000L, 100L)))
    assert(g.n == 3)
    assert(g.ids.toSeq == Seq(7L, 100L, 5000L))
    assert(g.ids.sorted.sameElements(g.ids))
  }

  test("idOf round-trips through edgeSeq") {
    val g = TestGraphs.randomSparseIds(20, 60, seed = 2)
    val back = DirectedGraph.fromEdges(g.edgeSeq)
    assert(back.n == g.n)
    assert(back.m == g.m)
    assert(back.edgeSeq.toSet == g.edgeSeq.toSet)
  }

  test("in-CSR and out-CSR describe the same edge set") {
    val g = TestGraphs.random(40, 200, seed = 3)
    val fromOut = (0 until g.n).flatMap { v =>
      val b = Seq.newBuilder[(Int, Int)]; g.foreachOut(v)(w => b += ((v, w))); b.result()
    }.toSet
    val fromIn = (0 until g.n).flatMap { v =>
      val b = Seq.newBuilder[(Int, Int)]; g.foreachIn(v)(w => b += ((w, v))); b.result()
    }.toSet
    assert(fromOut == fromIn)
  }

  test("empty graph builds and reports zero sizes") {
    val g = DirectedGraph.fromEdges(Seq.empty[(Long, Long)])
    assert(g.n == 0)
    assert(g.m == 0)
  }

  test("single-edge graph") {
    val g = DirectedGraph.fromEdges(Seq((42L, 43L)))
    assert(g.n == 2 && g.m == 1)
    assert(g.outDeg(0) == 1 && g.inDeg(1) == 1)
  }

  test("outSlice bounds cover exactly outDeg entries") {
    val g = TestGraphs.random(25, 100, seed = 4)
    for (v <- 0 until g.n) {
      val (_, lo, hi) = g.outSlice(v)
      assert(hi - lo == g.outDeg(v))
    }
  }

  test("edge count is stable under re-shuffling input order") {
    val edges = TestGraphs.random(30, 150, seed = 5).edgeSeq
    val shuffled = new scala.util.Random(9).shuffle(edges)
    val g1 = DirectedGraph.fromEdges(edges)
    val g2 = DirectedGraph.fromEdges(shuffled)
    assert(g1.m == g2.m)
    assert(g1.edgeSeq.toSet == g2.edgeSeq.toSet)
  }
}
