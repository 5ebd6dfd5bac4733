package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.graph.{GraphGen, LocalMetrics}
import repro.theory.Bounds

/** Seed- and shape-sweep properties of Distributed NE: Theorem 1 and the
  * capacity constraint must hold for *every* run, not just a lucky seed.
  */
class DistributedNEPropertySpec extends SparkSpec {

  private def run(edges: Array[(Long, Long)], p: Int, seed: Long,
                  lambda: Double = 0.1): (Array[(Long, Long, Int)], DistributedNE.Result) = {
    val res = DistributedNE.partition(spark,
      spark.sparkContext.parallelize(edges.toSeq, 4),
      DistributedNE.Config(p, lambda = lambda, seed = seed))
    val t = res.assignments.collect()
    res.assignments.unpersist(blocking = false)
    (t, res)
  }

  private val skewed = TestGraphs.skewed(350, 2000, seed = 123)

  for (seed <- Seq(1L, 17L, 99L)) {
    test(s"seed=$seed: Theorem 1 bound, capacity, completeness all hold") {
      val (t, res) = run(skewed, 4, seed)
      assert(t.length == skewed.length)
      val rf = LocalMetrics.replicationFactor(t)
      val ub = Bounds.theorem1(skewed.length, LocalMetrics.numVertices(skewed), 4)
      assert(rf <= ub + 1e-9, s"RF $rf above bound $ub")
      val cap = 1.1 * skewed.length / 4
      res.partitionSizes.foreach { s =>
        assert(s <= cap + 4 + 1, s"partition size $s exceeds cap $cap plus quota slack")
      }
    }
  }

  for (lambda <- Seq(0.05, 0.5, 1.0)) {
    test(s"lambda=$lambda: bound and capacity hold under multi-expansion") {
      val (t, res) = run(skewed, 4, seed = 5, lambda = lambda)
      val rf = LocalMetrics.replicationFactor(t)
      val ub = Bounds.theorem1(skewed.length, LocalMetrics.numVertices(skewed), 4)
      assert(rf <= ub + 1e-9)
      assert(res.iterations >= 1)
    }
  }

  test("a denser community graph keeps D.NE ahead of random across seeds") {
    val edges = GraphGen.communityGraph(spark, 8, 7, 6, 16, seed = 9).collect()
    val rfRand = LocalMetrics.replicationFactor(
      TestGraphs.triples(edges, TestGraphs.randomAssign(edges, 8)))
    for (seed <- Seq(2L, 3L)) {
      val (t, _) = run(edges, 8, seed)
      val rf = LocalMetrics.replicationFactor(t)
      assert(rf < rfRand, s"seed=$seed: D.NE $rf vs random $rfRand")
    }
  }

  test("partition count equal to a non-power-of-two still works (1D fallback grid)") {
    val edges = TestGraphs.skewed(100, 600)
    val (t, _) = run(edges, 6, seed = 4)
    assert(t.length == edges.length)
    t.foreach(x => assert(x._3 >= 0 && x._3 < 6))
  }
}
