package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.graph.LocalMetrics

/** Degenerate and boundary inputs for the driver-side baselines. */
class BaselineEdgeCasesSpec extends AnyFunSuite {

  private def rf(edges: Array[(Long, Long)], a: Array[Int]) =
    LocalMetrics.replicationFactor(TestGraphs.triples(edges, a))

  // ---- HDRF ----

  test("hdrf on a single edge uses one partition") {
    val a = HDRF.partition(Array((1L, 2L)), 8)
    assert(a.length == 1 && a(0) >= 0 && a(0) < 8)
  }

  test("hdrf capacity keeps balance even on a star (hub snowball)") {
    val edges = TestGraphs.star(400)
    val a = HDRF.partition(edges, 4)
    val eb = LocalMetrics.edgeBalance(TestGraphs.triples(edges, a))
    assert(eb <= 1.12, s"HDRF star EB $eb above capacity bound")
  }

  test("hdrf with p=1 assigns everything to partition 0") {
    assert(HDRF.partition(TestGraphs.k4, 1).forall(_ == 0))
  }

  // ---- SNE ----

  test("sne with chunk of one edge still terminates and covers") {
    val edges = TestGraphs.twoTriangles
    val a = SNE.partition(edges, 2, chunkEdges = 1)
    assert(a.length == edges.length)
    a.foreach(x => assert(x >= 0 && x < 2))
  }

  test("sne capacity holds on a star graph") {
    val edges = TestGraphs.star(300)
    val a = SNE.partition(edges, 4, chunkEdges = edges.length)
    val eb = LocalMetrics.edgeBalance(TestGraphs.triples(edges, a))
    assert(eb <= 1.12, s"SNE star EB $eb above capacity bound")
  }

  test("sne on an empty input is empty") {
    assert(SNE.partition(Array.empty[(Long, Long)], 4, chunkEdges = 10).isEmpty)
  }

  // ---- Sheep ----

  test("sheep on a star charges all edges to the leaves' chunks") {
    val edges = TestGraphs.star(50)
    val a = Sheep.partition(edges, 4)
    assert(a.length == 50)
    a.foreach(x => assert(x >= 0 && x < 4))
    // the hub is eliminated last; leaves split into chunks ⇒ RF stays small
    assert(rf(edges, a) <= 2.2)
  }

  test("sheep on a ring splits into contiguous arcs") {
    val edges = TestGraphs.ring(64)
    val a = Sheep.partition(edges, 4)
    assert(rf(edges, a) < 1.5, s"ring RF ${rf(edges, a)} should be near 1")
  }

  test("sheep handles a forest (disconnected paths)") {
    val edges = TestGraphs.path(10) ++ TestGraphs.path(10).map { case (u, v) => (u + 100, v + 100) }
    val a = Sheep.partition(edges, 2)
    assert(a.length == edges.length)
  }

  // ---- Multilevel ----

  test("multilevel on k4 with p=2 labels all four vertices") {
    val vp = MultilevelVertex.partition(TestGraphs.k4, 2)
    assert(vp.labels.length == 4)
    assert(vp.labels.forall(l => l >= 0 && l < 2))
  }

  test("multilevel handles p greater than vertex count") {
    val vp = MultilevelVertex.partition(TestGraphs.path(3), 8)
    assert(vp.labels.length == 4)
    vp.labels.foreach(l => assert(l >= 0 && l < 8))
  }

  // ---- Hybrid Ginger ----

  test("hybrid ginger on a star keeps the low-degree bundles movable") {
    val edges = TestGraphs.star(100)
    val a = HybridGinger.partition(edges, 4, threshold = 10)
    assert(a.length == 100)
    a.foreach(x => assert(x >= 0 && x < 4))
  }

  test("hybrid ginger single partition is trivial") {
    assert(HybridGinger.partition(TestGraphs.k4, 1).forall(_ == 0))
  }

  // ---- Label propagation ----

  test("spinner with p=1 labels everything 0") {
    val vp = LabelPropagation.spinner(TestGraphs.k4, 1)
    assert(vp.labels.forall(_ == 0))
  }

  test("xtrapulp on a single edge") {
    val vp = LabelPropagation.xtrapulp(Array((0L, 1L)), 2)
    assert(vp.labels.length == 2)
  }
}
