package repro.core

import org.apache.spark.rdd.RDD
import repro.{SparkSpec, TestGraphs}
import repro.graph.{GraphGen, LocalMetrics}
import repro.theory.Bounds

class DistributedNESpec extends SparkSpec {

  private def rddOf(edges: Array[(Long, Long)]): RDD[(Long, Long)] =
    spark.sparkContext.parallelize(edges.toSeq, 4)

  private def runOn(edges: Array[(Long, Long)], p: Int,
                    lambda: Double = 0.1, seed: Long = 42L): (Array[(Long, Long, Int)], DistributedNE.Result) = {
    val res = DistributedNE.partition(spark, rddOf(edges),
      DistributedNE.Config(numPartitions = p, lambda = lambda, seed = seed))
    val triples = res.assignments.collect().sortBy(t => (t._1, t._2))
    res.assignments.unpersist(blocking = false)
    (triples, res)
  }

  private def checkComplete(edges: Array[(Long, Long)], triples: Array[(Long, Long, Int)], p: Int): Unit = {
    assert(triples.length == edges.length, "every edge must be allocated exactly once")
    assert(triples.map(t => (t._1, t._2)).toSet == edges.toSet)
    triples.foreach(t => assert(t._3 >= 0 && t._3 < p, s"partition out of range: $t"))
  }

  test("single partition puts everything in partition 0 with RF 1") {
    val (triples, _) = runOn(TestGraphs.k4, p = 1)
    checkComplete(TestGraphs.k4, triples, 1)
    assert(LocalMetrics.replicationFactor(triples) == 1.0)
  }

  test("completeness on a path graph, P=2") {
    val edges = TestGraphs.path(20)
    val (triples, _) = runOn(edges, 2)
    checkComplete(edges, triples, 2)
  }

  test("completeness when partitions outnumber edges") {
    val edges = TestGraphs.path(3)
    val (triples, _) = runOn(edges, 8)
    checkComplete(edges, triples, 8)
  }

  test("completeness on two disconnected triangles (random restarts needed)") {
    val (triples, _) = runOn(TestGraphs.twoTriangles, 2)
    checkComplete(TestGraphs.twoTriangles, triples, 2)
  }

  test("completeness and range on a skewed graph, several partition counts") {
    val edges = TestGraphs.skewed(400, 2500)
    for (p <- Seq(2, 4, 8)) {
      val (triples, _) = runOn(edges, p)
      checkComplete(edges, triples, p)
    }
  }

  test("Theorem 1: RF is bounded by (|E|+|V|+|P|)/|V| on diverse graphs") {
    val graphs: Seq[(String, Array[(Long, Long)])] = Seq(
      "k4" -> TestGraphs.k4,
      "star" -> TestGraphs.star(30),
      "ring" -> TestGraphs.ring(40),
      "skewed" -> TestGraphs.skewed(300, 1500),
      "twoTriangles" -> TestGraphs.twoTriangles,
    )
    for ((name, edges) <- graphs; p <- Seq(2, 4)) {
      val (triples, _) = runOn(edges, p)
      val rf = LocalMetrics.replicationFactor(triples)
      val nV = LocalMetrics.numVertices(edges)
      val ub = Bounds.theorem1(edges.length, nV, p)
      assert(rf <= ub + 1e-9, s"$name p=$p: RF $rf exceeds Theorem-1 bound $ub")
    }
  }

  test("Theorem 2 construction (ring+clique) also respects the bound") {
    val edges = GraphGen.ringPlusClique(spark, 6).collect()
    val (triples, _) = runOn(edges, 4)
    checkComplete(edges, triples, 4)
    val ub = Bounds.theorem1(edges.length, LocalMetrics.numVertices(edges), 4)
    assert(LocalMetrics.replicationFactor(triples) <= ub + 1e-9)
  }

  test("edge balance stays near alpha on a mid-size RMAT graph") {
    val edges = GraphGen.rmat(spark, scale = 10, edgeFactor = 8, seed = 3).collect()
    val (triples, _) = runOn(edges, 4)
    checkComplete(edges, triples, 4)
    val eb = LocalMetrics.edgeBalance(triples)
    assert(eb <= 1.3, s"edge balance $eb too far above alpha=1.1")
  }

  test("quality: beats random hashing on a skewed RMAT graph") {
    val edges = GraphGen.rmat(spark, scale = 10, edgeFactor = 8, seed = 3).collect()
    val (triples, _) = runOn(edges, 8)
    val rfNE = LocalMetrics.replicationFactor(triples)
    val rfRand = LocalMetrics.replicationFactor(
      TestGraphs.triples(edges, TestGraphs.randomAssign(edges, 8)))
    assert(rfNE < rfRand, s"D.NE RF $rfNE should beat random RF $rfRand")
  }

  test("quality: near-perfect on a road lattice") {
    val edges = GraphGen.roadLattice(spark, 40, 40, seed = 3).collect()
    val (triples, _) = runOn(edges, 4)
    val rf = LocalMetrics.replicationFactor(triples)
    assert(rf < 1.3, s"road-lattice RF should approach 1, got $rf")
  }

  test("deterministic: same seed, same partitioning") {
    val edges = TestGraphs.skewed(200, 1000)
    val (a, _) = runOn(edges, 4, seed = 7)
    val (b, _) = runOn(edges, 4, seed = 7)
    assert(a.toSeq == b.toSeq)
  }

  test("different seeds may differ (seed actually feeds the run)") {
    val edges = TestGraphs.skewed(200, 1000)
    val (a, _) = runOn(edges, 4, seed = 1)
    val (b, _) = runOn(edges, 4, seed = 2)
    // not a strict requirement, but with 1000 edges a collision of the full
    // assignment would indicate the seed is ignored
    assert(a.toSeq != b.toSeq)
  }

  test("multi-expansion: larger lambda takes fewer iterations (Fig. 6 trend)") {
    val edges = GraphGen.rmat(spark, scale = 9, edgeFactor = 8, seed = 3).collect()
    val (_, slow) = runOn(edges, 4, lambda = 0.02)
    val (_, fast) = runOn(edges, 4, lambda = 1.0)
    assert(fast.iterations < slow.iterations,
      s"lambda=1.0 (${fast.iterations} iters) must beat lambda=0.02 (${slow.iterations})")
    assert(fast.iterations <= 60, s"lambda=1.0 should converge quickly, took ${fast.iterations}")
  }

  test("partition sizes in the result sum to the edge count") {
    val edges = TestGraphs.skewed(300, 1500, seed = 5)
    val (_, res) = runOn(edges, 4)
    assert(res.partitionSizes.sum == edges.length)
    assert(res.numEdges == edges.length)
  }

  test("config validation rejects bad parameters") {
    intercept[IllegalArgumentException](DistributedNE.Config(0))
    intercept[IllegalArgumentException](DistributedNE.Config(4, alpha = 1.0))
    intercept[IllegalArgumentException](DistributedNE.Config(4, lambda = 0.0))
    intercept[IllegalArgumentException](DistributedNE.Config(4, lambda = 1.5))
  }

  test("empty graph is rejected") {
    intercept[IllegalArgumentException] {
      DistributedNE.partition(spark, spark.sparkContext.emptyRDD[(Long, Long)],
        DistributedNE.Config(2))
    }
  }
}
