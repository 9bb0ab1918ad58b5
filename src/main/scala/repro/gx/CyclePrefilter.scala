package repro.gx

import org.apache.spark.graphx.{Edge, Graph}
import org.apache.spark.graphx.lib.StronglyConnectedComponents
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.storage.StorageLevel

/** GraphX-based cycle prefilter: keep only vertices inside a non-trivial
  * strongly connected component.
  *
  * Every directed cycle — in particular every constrained cycle — lies
  * entirely inside one SCC with ≥ 2 members, so dropping trivial-SCC
  * vertices is safe and ignores k (it composes with the k-bounded
  * [[repro.dist.ClosedWalkFilter]] for the hop-aware shrink). This is the
  * GraphX substrate alternative mentioned in DESIGN.md; production graphs
  * (web, social) typically have a giant SCC plus a large acyclic fringe
  * that this pass deletes in a handful of Pregel supersteps.
  */
object CyclePrefilter {

  /** Vertex ids that belong to an SCC of size ≥ 2. */
  def candidates(spark: SparkSession, edges: DataFrame, numIter: Int = 20): DataFrame = {
    import spark.implicits._
    val edgeRdd: RDD[Edge[Int]] = edges
      .select($"src".cast("long"), $"dst".cast("long"))
      .as[(Long, Long)]
      .rdd
      .filter { case (s, d) => s != d }
      .map { case (s, d) => Edge(s, d, 1) }
    val graph = Graph.fromEdges(edgeRdd, defaultValue = 0,
      edgeStorageLevel = StorageLevel.MEMORY_AND_DISK,
      vertexStorageLevel = StorageLevel.MEMORY_AND_DISK)
    val scc = StronglyConnectedComponents.run(graph, numIter)
    val bySize = scc.vertices // (vid, sccRoot)
      .map { case (_, root) => (root, 1L) }
      .reduceByKey(_ + _)
    val keep = scc.vertices
      .map { case (vid, root) => (root, vid) }
      .join(bySize.filter(_._2 >= 2))
      .map { case (_, (vid, _)) => vid }
    keep.toDF("v")
  }

  /** Induced subgraph on non-trivial-SCC vertices. */
  def coreEdges(spark: SparkSession, edges: DataFrame, numIter: Int = 20): DataFrame = {
    val cand = candidates(spark, edges, numIter)
    edges
      .join(cand.withColumnRenamed("v", "src"), "src")
      .join(cand.withColumnRenamed("v", "dst"), "dst")
      .select("src", "dst")
  }
}
