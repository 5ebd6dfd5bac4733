package repro.baselines

import repro.core.SubGraphState
import scala.collection.mutable

/** Sheep (Margo & Seltzer, PVLDB'15) — the elimination-tree edge
  * partitioner the paper calls the state-of-the-art high-quality
  * distributed method.
  *
  * Reproduction of the published pipeline on one node:
  *  1. order vertices by (degree, id) ascending — Sheep's degree-based
  *     elimination order;
  *  2. build the elimination tree with union–find: eliminating v attaches
  *     the components of its lower-ordered neighbors under v;
  *  3. charge every edge to the tree node of its lower-ordered endpoint;
  *  4. partition the tree bottom-up into |P| weight-balanced chunks; an
  *     edge inherits the chunk of the node it was charged to.
  *
  * Matches the paper's observed behaviour: near-perfect on tree-like /
  * road graphs, mediocre on dense social graphs (Pokec, Orkut).
  */
object Sheep {

  def partition(edges: Array[(Long, Long)], p: Int): Array[Int] = {
    require(p >= 1)
    val st = SubGraphState.build(0, edges)
    val n = st.numLocalVertices
    val out = new Array[Int](edges.length)
    if (n == 0) return out

    // 1. elimination order by ascending degree
    val degree = Array.tabulate(n)(lv => st.adjOff(lv + 1) - st.adjOff(lv))
    val order = Array.tabulate(n)(identity)
      .sortBy(lv => (degree(lv), st.vertexIds(lv)))
    val rank = new Array[Int](n)
    order.zipWithIndex.foreach { case (lv, r) => rank(lv) = r }

    // 2. elimination tree via union–find
    val parent = Array.fill(n)(-1)
    val ufParent = Array.tabulate(n)(identity)
    val ufTop = Array.tabulate(n)(identity) // highest eliminated vertex in set
    def find(x: Int): Int = {
      var r = x
      while (ufParent(r) != r) r = ufParent(r)
      var c = x
      while (ufParent(c) != r) { val nx = ufParent(c); ufParent(c) = r; c = nx }
      r
    }
    order.foreach { v =>
      var k = st.adjOff(v)
      while (k < st.adjOff(v + 1)) {
        val e = st.adjEdge(k)
        val u0 = if (st.srcs(e) == st.vertexIds(v)) st.dsts(e) else st.srcs(e)
        val u = st.vertexIndex.get(u0)
        if (rank(u) < rank(v)) {
          val ru = find(u)
          val top = ufTop(ru)
          if (top != v && parent(top) < 0) {
            parent(top) = v
            ufParent(ru) = find(v)
            ufTop(find(v)) = v
          }
        }
        k += 1
      }
    }

    // 3. edge weights charged to the lower-ordered endpoint
    val weight = new Array[Long](n)
    var e = 0
    while (e < edges.length) {
      val lu = st.vertexIndex.get(st.srcs(e))
      val lv = st.vertexIndex.get(st.dsts(e))
      weight(if (rank(lu) < rank(lv)) lu else lv) += 1
      e += 1
    }

    // 4. bottom-up tree partitioning into |P| weight chunks: walking the
    // elimination order is a topological order of the tree (children first)
    val chunk = Array.fill(n)(-1)
    val acc = weight.clone()
    val capacity = math.max(1L, math.ceil(edges.length.toDouble / p).toLong)
    var nextChunk = 0
    order.foreach { v =>
      if (acc(v) >= capacity && nextChunk < p - 1) {
        chunk(v) = nextChunk // cut: v roots a new chunk
        nextChunk += 1
        acc(v) = 0           // subtree removed from the running weight
      }
      val pr = parent(v)
      if (pr >= 0) acc(pr) += acc(v)
    }
    // top-down inheritance (parents have higher elimination rank, so walk
    // the order backwards): an uncut vertex joins its nearest cut ancestor;
    // anything above every cut — including the roots — forms the last chunk
    val lastChunk = nextChunk
    order.reverseIterator.foreach { v =>
      if (chunk(v) < 0) {
        val pr = parent(v)
        chunk(v) = if (pr >= 0) chunk(pr) else lastChunk
      }
    }

    e = 0
    while (e < edges.length) {
      val lu = st.vertexIndex.get(st.srcs(e))
      val lw = st.vertexIndex.get(st.dsts(e))
      out(e) = chunk(if (rank(lu) < rank(lw)) lu else lw)
      e += 1
    }
    out
  }
}
