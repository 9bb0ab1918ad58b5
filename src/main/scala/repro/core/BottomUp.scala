package repro.core

import scala.collection.mutable

/** The paper's Bottom-Up algorithms (Section V): BUR (Algorithm 4) and the
  * minimal pruning pass that upgrades it to BUR+ (Algorithm 7).
  *
  * BUR iterates vertices in ascending id order; for each start vertex it
  * repeatedly finds a constrained cycle (FindCycle, a bounded DFS), bumps
  * the hit-count H of every vertex on it, moves the highest-H vertex of the
  * cycle into the cover (removing its edges), and continues until no cycle
  * through the start vertex remains. Ties on H resolve to the earliest
  * vertex of the cycle, matching Algorithm 6's initialisation with v0.
  *
  * BUR+ then walks the cover in insertion order and drops every vertex v
  * that has no witness cycle in (G − R) + v, producing a minimal cover
  * (Theorem 4).
  */
object BottomUp {

  def cover(g: DirectedGraph, k: Int, minLen: Int = 3,
            minimalPrune: Boolean = false,
            budget: SearchBudget = SearchBudget.Unlimited): CoverResult = {
    require(k >= minLen, s"hop constraint k=$k below minimum cycle length $minLen")
    val hits = new Array[Long](g.n)
    val inCover = new Array[Boolean](g.n)
    val order = mutable.ArrayBuffer.empty[Int] // cover insertion order
    val present: Int => Boolean = v => !inCover(v)
    var cyclesFound = 0L

    var v = 0
    while (v < g.n) {
      var continue = !inCover(v)
      while (continue) {
        val c = BruteForce.findCycleThrough(g, k, minLen, v, present, budget)
        if (c == null) continue = false
        else {
          cyclesFound += 1
          var i = 0
          while (i < c.length) { hits(c(i)) += 1; i += 1 }
          // FindCoverNode (Algorithm 6): first vertex achieving max H.
          var best = c(0)
          i = 1
          while (i < c.length) {
            if (hits(c(i)) > hits(best)) best = c(i)
            i += 1
          }
          inCover(best) = true
          order += best
          if (best == v) continue = false // v itself covers everything through v
        }
      }
      v += 1
    }

    var prunedCount = 0L
    if (minimalPrune) {
      // Algorithm 7: keep v only if it still witnesses a cycle once every
      // OTHER cover vertex is removed from the graph.
      for (u <- order if inCover(u)) {
        val allowedFn: Int => Boolean = x => !inCover(x) || x == u
        if (!BruteForce.existsCycleThrough(g, k, minLen, u, allowedFn, budget)) {
          inCover(u) = false
          prunedCount += 1
        }
      }
    }

    val ids = (0 until g.n).iterator.filter(inCover).map(g.idOf).toArray
    CoverResult(ids, Map("cyclesFound" -> cyclesFound, "pruned" -> prunedCount))
  }
}
