package repro.core

/** Checks a computed cover for feasibility (no constrained cycle survives
  * in G − C) and minimality (every cover vertex has a private witness
  * cycle). Tests use the plain-DFS flavour for independence from the block
  * machinery; benches use the fast flavour for large graphs.
  */
object CoverValidator {

  private def allowedFn(g: DirectedGraph, coverIds: Array[Long]): Int => Boolean = {
    val inCover = new Array[Boolean](g.n)
    coverIds.foreach { id =>
      val v = java.util.Arrays.binarySearch(g.ids, id)
      if (v >= 0) inCover(v) = true
    }
    v => !inCover(v)
  }

  /** Valid ⟺ the graph induced on V − C has no constrained cycle. */
  def isValid(g: DirectedGraph, k: Int, minLen: Int, coverIds: Array[Long],
              fast: Boolean = false): Boolean = {
    val allowed = allowedFn(g, coverIds)
    if (!fast) !BruteForce.existsConstrainedCycle(g, k, minLen, allowed)
    else {
      val filter = new BfsFilter(g, k)
      val blockDfs = new BlockDfsValidator(g, k, minLen)
      var v = 0
      while (v < g.n) {
        if (allowed(v) && filter.mayHaveCycle(v, allowed) &&
            blockDfs.existsCycleThrough(v, allowed)) return false
        v += 1
      }
      true
    }
  }

  /** Minimal ⟺ for each c ∈ C there is a constrained cycle through c whose
    * other vertices all avoid C.
    */
  def isMinimal(g: DirectedGraph, k: Int, minLen: Int, coverIds: Array[Long],
                fast: Boolean = false): Boolean = {
    val inCover = new Array[Boolean](g.n)
    coverIds.foreach { id =>
      val v = java.util.Arrays.binarySearch(g.ids, id)
      if (v >= 0) inCover(v) = true
    }
    val blockDfs = new BlockDfsValidator(g, k, minLen)
    coverIds.forall { id =>
      val c = java.util.Arrays.binarySearch(g.ids, id)
      c >= 0 && {
        val allowed: Int => Boolean = x => !inCover(x) || x == c
        if (!fast) BruteForce.existsCycleThrough(g, k, minLen, c, allowed)
        else blockDfs.existsCycleThrough(c, allowed)
      }
    }
  }
}
