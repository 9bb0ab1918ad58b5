package repro.dist

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed candidate filtering for hop-constrained cycle cover.
  *
  * Two bulk DataFrame passes that shrink a billion-scale graph to its
  * "cyclic core" — the subgraph that can possibly contain constrained
  * cycles — before the exact Top-Down pass runs:
  *
  *  1. [[trim]]: iteratively delete vertices with in-degree 0 or
  *     out-degree 0 (they lie on no cycle of any length). This is the
  *     classic SCC trim step expressed as DataFrame joins.
  *
  *  2. [[candidates]]: k rounds of frontier-expansion joins computing, for
  *     every surviving vertex v, whether v lies on a directed closed walk
  *     of length ≤ k. Every vertex of every constrained cycle does (the
  *     cycle itself is such a walk), so the result is a SAFE superset of
  *     the vertices the exact algorithm can ever keep — the distributed
  *     analogue of the paper's BFS-filter (Algorithm 11), batched over all
  *     vertices at once.
  *
  * Both passes preserve every constrained cycle: the induced subgraph on
  * `candidates` contains each simple cycle of length ≤ k in full.
  *
  * Every iteration eagerly `localCheckpoint`s its frontier/visited state:
  * iterative DataFrame algorithms otherwise accumulate a join lineage whose
  * re-planning cost grows super-linearly with the round number.
  */
object ClosedWalkFilter {

  /** Normalise an edge DataFrame: long src/dst, no self-loops, distinct. */
  def clean(edges: DataFrame): DataFrame =
    edges.select(col("src").cast("long") as "src", col("dst").cast("long") as "dst")
      .filter(col("src") =!= col("dst"))
      .distinct()

  /** Iteratively remove vertices with no in- or no out-edge (≤ maxIter
    * rounds, or until the edge count stops shrinking).
    */
  def trim(edges: DataFrame, maxIter: Int = 50): DataFrame = {
    var cur = clean(edges).localCheckpoint()
    var curCount = cur.count()
    var it = 0
    var done = curCount == 0
    while (!done && it < maxIter) {
      val srcs = cur.select(col("src") as "v").distinct()
      val dsts = cur.select(col("dst") as "v").distinct()
      val both = srcs.intersect(dsts) // vertices with outDeg>0 AND inDeg>0
      val next = cur
        .join(both.withColumnRenamed("v", "src"), "src")
        .join(both.withColumnRenamed("v", "dst"), "dst")
        .select("src", "dst")
        .localCheckpoint()
      val nextCount = next.count()
      if (nextCount == curCount) done = true
      else { cur = next; curCount = nextCount }
      it += 1
    }
    cur
  }

  /** Vertices lying on a directed closed walk of length in [2, k].
    *
    * Three exact sub-filters, cheapest first, so the expensive per-root
    * BFS only runs for the vertices the cheap passes could not certify:
    *
    *  1. reciprocal pairs (closed walk of length 2): one self-join;
    *  2. triangles (length 3): two bounded joins — in a dense cyclic core
    *     this certifies almost every vertex, avoiding the quadratic
    *     roots × reach blow-up of the BFS pass;
    *  3. per-root BFS batched as DataFrame joins for the remaining roots:
    *     `visited` accumulates (root, v) pairs; each round extends the
    *     newest frontier by one edge; a root whose frontier returns to it
    *     is cyclic and its rows are dropped from further rounds.
    */
  def candidates(edges: DataFrame, k: Int): DataFrame = {
    val e = trim(edges)
      .select(col("src") as "esrc", col("dst") as "edst")
      .localCheckpoint()

    // 1. reciprocal pairs: edge (u,v) with twin (v,u)
    val flipped = e.select(col("edst") as "esrc", col("esrc") as "edst")
    val onPair = e.intersect(flipped)
      .select(col("esrc") as "v")
      .distinct()
      .localCheckpoint()

    // 2. triangles: u -> x -> y -> u (vertices of any 3-closed-walk; with
    // self-loops removed these are genuine triangles, length 3 <= k)
    val onTriangle =
      if (k < 3) onPair.filter(lit(false))
      else {
        val ab = e.select(col("esrc") as "a", col("edst") as "b")
        val bc = e.select(col("esrc") as "b", col("edst") as "c")
        val ca = e.select(col("esrc") as "c", col("edst") as "a")
        ab.join(bc, "b").join(ca, Seq("c", "a"))
          .select(explode(array(col("a"), col("b"), col("c"))) as "v")
          .distinct()
          .localCheckpoint()
      }

    val certified = onPair.union(onTriangle).distinct().localCheckpoint()

    // 3. per-root bounded BFS for everything else
    var frontier = e
      .join(certified.withColumnRenamed("v", "esrc"), Seq("esrc"), "left_anti")
      .select(col("esrc") as "root", col("edst") as "v")
      .localCheckpoint()
    var visited = frontier
    var cyclic = frontier.filter(col("root") === col("v")).select("root") // empty: no self-loops
      .localCheckpoint()
    var d = 1
    while (d < k && frontier.take(1).nonEmpty) {
      val grown = frontier
        .join(e, col("v") === col("esrc"))
        .select(col("root"), col("edst") as "v")
        .distinct()
        .localCheckpoint()
      val newCyclic = grown.filter(col("root") === col("v")).select("root").distinct()
      cyclic = cyclic.union(newCyclic).distinct().localCheckpoint()
      frontier = grown
        .join(visited, Seq("root", "v"), "left_anti")   // only newly reached pairs
        .join(cyclic, Seq("root"), "left_anti")          // cyclic roots are settled
        .localCheckpoint()
      visited = visited.union(frontier).distinct().localCheckpoint()
      d += 1
    }
    certified.union(cyclic.select(col("root") as "v")).distinct()
  }

  /** Induced subgraph of `edges` on the candidate vertex set. */
  def coreEdges(edges: DataFrame, k: Int): DataFrame = {
    val cand = candidates(edges, k).localCheckpoint()
    clean(edges)
      .join(cand.withColumnRenamed("v", "src"), "src")
      .join(cand.withColumnRenamed("v", "dst"), "dst")
      .select("src", "dst")
  }
}
