package repro.gx

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.core.BruteForce
import repro.testkit.TestGraphs

class CyclePrefilterSpec extends SparkSpec {

  private def df(pairs: (Int, Int)*): DataFrame = {
    import spark.implicits._
    pairs.map { case (s, d) => (s.toLong, d.toLong) }.toDF("src", "dst")
  }

  private def candidateSet(edges: DataFrame): Set[Long] =
    CyclePrefilter.candidates(spark, edges, numIter = 50).collect().map(_.getLong(0)).toSet

  test("triangle: all vertices in one non-trivial SCC") {
    assert(candidateSet(df((0, 1), (1, 2), (2, 0))) == Set(0L, 1L, 2L))
  }

  test("DAG: no candidates") {
    assert(candidateSet(df((0, 1), (0, 2), (1, 3), (2, 3))).isEmpty)
  }

  test("cycle plus acyclic tail: tail dropped") {
    assert(candidateSet(df((0, 1), (1, 2), (2, 0), (2, 3), (3, 4))) == Set(0L, 1L, 2L))
  }

  test("2-cycle counts as a non-trivial SCC (k-agnostic prefilter)") {
    assert(candidateSet(df((0, 1), (1, 0))) == Set(0L, 1L))
  }

  test("prefilter is a superset of constrained-cycle vertices on random graphs") {
    for (seed <- Seq(1, 6)) {
      val g = TestGraphs.random(18, 50, seed)
      val edges = df(g.edgeSeq.map { case (s, d) => (s.toInt, d.toInt) }: _*)
      val cand = candidateSet(edges)
      val onCycle = BruteForce.enumerateCycles(g, 6).flatten.map(g.idOf).toSet
      assert(onCycle.subsetOf(cand), s"seed=$seed")
    }
  }

  test("coreEdges keeps only intra-candidate edges") {
    val core = CyclePrefilter.coreEdges(spark, df((0, 1), (1, 2), (2, 0), (2, 3)), numIter = 50)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(core == Set((0L, 1L), (1L, 2L), (2L, 0L)))
  }
}
