package repro.baselines

import repro.core.SubGraphState
import repro.graph.Hashing
import scala.collection.mutable

/** Label-propagation *vertex* partitioners:
  *
  *  - [[spinner]] — Spinner (Martella et al. ICDE'17): random initial
  *    labels, then capacity-aware LP. The random init is exactly why the
  *    paper classifies it with the hash family quality-wise.
  *  - [[xtrapulp]] — XtraPuLP-like (Slota et al. IPDPS'17): |P| BFS-grown
  *    seeds (no random allocation), then the same constrained LP.
  *
  * Both return a per-vertex label over the local-vertex index of the CSR
  * built from the edges; use [[VertexCutConversion]] to obtain the edge
  * partitioning the paper evaluates (each edge goes to a random endpoint's
  * partition, as in Bourse et al. KDD'14).
  */
object LabelPropagation {

  final case class VertexPartition(st: SubGraphState, labels: Array[Int])

  def spinner(edges: Array[(Long, Long)], p: Int,
              iterations: Int = 20, seed: Long = 42L,
              capacityFactor: Double = 1.05): VertexPartition = {
    val st = SubGraphState.build(0, edges)
    val labels = Array.tabulate(st.numLocalVertices) { lv =>
      Hashing.bucket(st.vertexIds(lv), p, seed)
    }
    refine(st, labels, p, iterations, capacityFactor)
    VertexPartition(st, labels)
  }

  def xtrapulp(edges: Array[(Long, Long)], p: Int,
               iterations: Int = 20, seed: Long = 42L,
               capacityFactor: Double = 1.05): VertexPartition = {
    val st = SubGraphState.build(0, edges)
    val n = st.numLocalVertices
    val labels = Array.fill(n)(-1)
    if (n > 0) {
      // |P| spread-out seeds, grown breadth-first until every vertex is
      // labeled — a direct label assignment with no random allocation.
      val queue = mutable.Queue.empty[Int]
      var q = 0
      while (q < p) {
        val s = Math.floorMod(Hashing.mix64(seed + q), n.toLong).toInt
        if (labels(s) < 0) { labels(s) = q; queue.enqueue(s) }
        q += 1
      }
      if (queue.isEmpty) { labels(0) = 0; queue.enqueue(0) }
      while (queue.nonEmpty) {
        val lv = queue.dequeue()
        var k = st.adjOff(lv)
        while (k < st.adjOff(lv + 1)) {
          val e = st.adjEdge(k)
          val w = if (st.srcs(e) == st.vertexIds(lv)) st.dsts(e) else st.srcs(e)
          val lw = st.vertexIndex.get(w)
          if (labels(lw) < 0) { labels(lw) = labels(lv); queue.enqueue(lw) }
          k += 1
        }
        // disconnected components: restart BFS from the next unlabeled
        if (queue.isEmpty) {
          var i = 0
          var found = false
          while (i < n && !found) {
            if (labels(i) < 0) {
              labels(i) = i % p; queue.enqueue(i); found = true
            }
            i += 1
          }
        }
      }
    }
    refine(st, labels, p, iterations, capacityFactor)
    VertexPartition(st, labels)
  }

  /** Capacity-aware LP sweep: each vertex adopts the most frequent neighbor
    * label whose projected degree-load stays below `capacityFactor` × mean.
    */
  private def refine(st: SubGraphState, labels: Array[Int], p: Int,
                     iterations: Int, capacityFactor: Double): Unit = {
    val n = st.numLocalVertices
    if (n == 0) return
    val degLoad = new Array[Long](p)
    var lv = 0
    while (lv < n) {
      degLoad(labels(lv)) += st.adjOff(lv + 1) - st.adjOff(lv)
      lv += 1
    }
    val cap = math.max(1L, (capacityFactor * degLoad.sum / p).toLong)
    val counts = new Array[Int](p)
    var it = 0
    var changedAny = true
    while (it < iterations && changedAny) {
      changedAny = false
      lv = 0
      while (lv < n) {
        java.util.Arrays.fill(counts, 0)
        var k = st.adjOff(lv)
        while (k < st.adjOff(lv + 1)) {
          val e = st.adjEdge(k)
          val w = if (st.srcs(e) == st.vertexIds(lv)) st.dsts(e) else st.srcs(e)
          counts(labels(st.vertexIndex.get(w))) += 1
          k += 1
        }
        val deg = (st.adjOff(lv + 1) - st.adjOff(lv)).toLong
        val cur = labels(lv)
        var best = cur
        var bestCount = counts(cur)
        var q = 0
        while (q < p) {
          if (counts(q) > bestCount && degLoad(q) + deg <= cap) {
            best = q; bestCount = counts(q)
          }
          q += 1
        }
        if (best != cur) {
          degLoad(cur) -= deg
          degLoad(best) += deg
          labels(lv) = best
          changedAny = true
        }
        lv += 1
      }
      it += 1
    }
  }
}
