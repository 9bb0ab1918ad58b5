package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Distributed hop-constrained simple-cycle enumeration (DataFrame joins).
  *
  * The dataflow analogue of the paper's FindCycle search: paths grow one
  * edge per round via a self-join, keeping the visited-vertex list in an
  * array column, and rows whose head returns to their start vertex close a
  * simple cycle. Every simple cycle of length L is closed exactly L times
  * (once per rotation), so [[closingCount]] equals Σ_cycles length — a
  * quantity the DuckDB oracle can recompute with a recursive CTE, which is
  * how the test suite certifies this operator end-to-end.
  *
  * Exponential in k like any enumeration; intended for validation scale.
  */
object CycleEnum {

  /** All cycle-closing path rows: (start, path, len) with len in [minLen, k]. */
  def closings(edges: DataFrame, k: Int, minLen: Int = 3): DataFrame = {
    val e = ClosedWalkFilter.clean(edges)
      .select(col("src") as "esrc", col("dst") as "edst")
    var open = ClosedWalkFilter.clean(edges).select(
      col("src") as "start",
      col("dst") as "cur",
      array(col("src"), col("dst")) as "path",
      lit(1) as "len",
    )
    var closed = open.filter(lit(false)) // empty, same schema
    var d = 2
    while (d <= k) {
      val ext = open
        .join(e, open("cur") === e("esrc"))
        // interior vertices must be fresh; returning to `start` is the one
        // allowed repeat (start sits only at path position 1).
        .filter(!array_contains(slice(col("path"), 2, k + 1), col("edst")))
        .select(
          col("start"),
          col("edst") as "cur",
          concat(col("path"), array(col("edst"))) as "path",
          (col("len") + 1) as "len",
        )
      closed = closed.union(ext.filter(col("cur") === col("start") && col("len") >= minLen))
        .localCheckpoint() // truncate the per-round join lineage
      open = ext.filter(col("cur") =!= col("start")).localCheckpoint()
      d += 1
    }
    closed.filter(col("len") <= k)
  }

  /** Number of closing rows = Σ over constrained cycles of their length. */
  def closingCount(edges: DataFrame, k: Int, minLen: Int = 3): Long =
    closings(edges, k, minLen).count()
}
