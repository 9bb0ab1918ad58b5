package repro.core

/** Result of a cover computation.
  *
  * @param cover  original vertex ids in the cover, ascending
  * @param stats  algorithm counters (search visits, filter prunes, ...)
  */
final case class CoverResult(cover: Array[Long], stats: Map[String, Long]) {
  def size: Int = cover.length
}

/** The paper's Top-Down algorithm (Section VI, Algorithm 8) with its three
  * instrumentation levels.
  *
  * The cover starts as ALL vertices; vertices are examined in ascending
  * original-id order. For vertex v we ask whether a constrained cycle
  * through v exists in the graph induced on D ∪ {v}, where D is the set of
  * vertices already released from the cover. If yes, v stays in the cover
  * (and contributes no edges to later searches); if no, v joins D.
  *
  * This yields a cover that is valid (for any constrained cycle, its
  * last-examined vertex was kept: all its other vertices were already in D,
  * so the witness search saw the whole cycle) and minimal (every kept v has
  * a witness cycle whose other vertices are permanently outside the cover).
  *
  * Variants — identical covers, different validation cost:
  *   - TDB    : plain bounded DFS validation
  *   - TDB+   : block ("barrier") DFS, O(k·m) per validation ⇒ O(k·m·n) total
  *   - TDB++  : TDB+ preceded by the linear BFS-filter (Algorithm 11)
  */
object TopDown {

  sealed trait Variant
  case object TDB extends Variant
  case object TDBPlus extends Variant
  case object TDBPlusPlus extends Variant

  def cover(g: DirectedGraph, k: Int, minLen: Int = 3,
            variant: Variant = TDBPlusPlus,
            budget: SearchBudget = SearchBudget.Unlimited): CoverResult = {
    require(k >= minLen, s"hop constraint k=$k below minimum cycle length $minLen")
    val allowed = new Array[Boolean](g.n) // membership in D ∪ {current v}
    val inCover = new Array[Boolean](g.n)
    val validator: NodeValidator = variant match {
      case TDB => new PlainDfsValidator(g, k, minLen, budget)
      case _   => new BlockDfsValidator(g, k, minLen)
    }
    val filter = if (variant == TDBPlusPlus) new BfsFilter(g, k) else null
    var validations = 0L
    var coverCount = 0
    val allowedFn: Int => Boolean = allowed

    var v = 0
    while (v < g.n) {
      allowed(v) = true
      val mayCycle = filter == null || filter.mayHaveCycle(v, allowedFn)
      val necessary = mayCycle && {
        validations += 1
        validator.existsCycleThrough(v, allowedFn)
      }
      if (necessary) {
        inCover(v) = true
        coverCount += 1
        allowed(v) = false // kept in cover: its edges never enter G0 again
      }
      v += 1
    }

    val ids = new Array[Long](coverCount)
    var i = 0; var w = 0
    while (i < g.n) {
      if (inCover(i)) { ids(w) = g.idOf(i); w += 1 }
      i += 1
    }
    CoverResult(
      ids,
      Map(
        "validations" -> validations,
        "dfsVisits"   -> validator.visits,
        "bfsPruned"   -> (if (filter == null) 0L else filter.pruned),
        "bfsCalls"    -> (if (filter == null) 0L else filter.calls),
      ),
    )
  }
}
