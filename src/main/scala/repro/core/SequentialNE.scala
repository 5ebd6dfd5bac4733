package repro.core

import scala.collection.mutable

/** Sequential Neighbor Expansion (NE, Zhang et al. KDD'17) — the offline
  * single-machine state of the art the paper compares against in Table 4.
  *
  * Partitions are computed one after another; each grows from a seed vertex
  * by repeatedly expanding the boundary vertex with minimal remaining degree
  * (Eq. 4) and absorbing two-hop edges that satisfy Condition (5). The last
  * partition is uncapped and absorbs the remainder.
  *
  * Driver-side by design: the whole point of the paper is that this
  * algorithm requires the entire graph in one memory.
  */
object SequentialNE {

  final case class Config(numPartitions: Int, alpha: Double = 1.1, seed: Long = 42L) {
    require(numPartitions >= 1 && alpha > 1.0)
  }

  /** @return per-edge partition ids aligned with `edges`. */
  def partition(edges: Array[(Long, Long)], cfg: Config): Array[Int] = {
    val st = SubGraphState.build(0, edges)
    val m = st.numEdges
    val n = st.numLocalVertices
    val out = st.alloc // -1 everywhere; we mutate the freshly built state
    if (m == 0) return out
    val unalloc = st.unallocCount
    val member: Array[mutable.BitSet] = Array.fill(n)(mutable.BitSet.empty)
    var remaining = m
    var scanCursor = 0 // seeded start for random restarts, then linear scan
    val startAt = Math.floorMod(repro.graph.Hashing.mix64(cfg.seed), n.toLong).toInt

    def nextUnallocatedVertex(): Int = {
      while (scanCursor < n && unalloc((startAt + scanCursor) % n) == 0) scanCursor += 1
      require(scanCursor < n, "no unallocated vertex although edges remain")
      (startAt + scanCursor) % n
    }

    var p = 0
    while (p < cfg.numPartitions && remaining > 0) {
      val cap =
        if (p == cfg.numPartitions - 1) Long.MaxValue
        else math.ceil(cfg.alpha * m / cfg.numPartitions).toLong
      var size = 0L
      val heap = mutable.PriorityQueue.empty[(Int, Int)](
        Ordering.Tuple2[Int, Int].reverse) // (drest, localVertex) min-heap
      val expanded = new java.util.BitSet(n)

      def allocate(e: Int, part: Int): Unit = {
        out(e) = part
        remaining -= 1
        size += 1
        var side = 0
        while (side < 2) {
          val x = if (side == 0) st.srcs(e) else st.dsts(e)
          val lx = st.vertexIndex.get(x)
          unalloc(lx) -= 1
          side += 1
        }
      }

      /** Expand `lv` into partition p: one-hop + Condition-(5) two-hop.
        * The cap is enforced per edge (a hub's neighborhood can exceed a
        * partition's whole capacity at repro scale); skipped edges remain
        * for later partitions.
        */
      def expand(lv: Int): Unit = {
        expanded.set(lv)
        member(lv) += p
        val newBoundary = mutable.ArrayBuffer.empty[Int]
        var k = st.adjOff(lv)
        while (k < st.adjOff(lv + 1) && size < cap) {
          val e = st.adjEdge(k)
          if (out(e) < 0) {
            val u = if (st.srcs(e) == st.vertexIds(lv)) st.dsts(e) else st.srcs(e)
            val lu = st.vertexIndex.get(u)
            allocate(e, p)
            if (!member(lu).contains(p)) { member(lu) += p; newBoundary += lu }
          }
          k += 1
        }
        // two-hop: edges between the new boundary and any vertex already in
        // V(E_p) never increase replication (Condition (5))
        newBoundary.foreach { lu =>
          var j = st.adjOff(lu)
          while (j < st.adjOff(lu + 1) && size < cap) {
            val e = st.adjEdge(j)
            if (out(e) < 0) {
              val w = if (st.srcs(e) == st.vertexIds(lu)) st.dsts(e) else st.srcs(e)
              val lw = st.vertexIndex.get(w)
              if (member(lw).contains(p)) allocate(e, p)
            }
            j += 1
          }
          if (unalloc(lu) > 0) heap.enqueue((unalloc(lu), lu))
        }
      }

      while (size < cap && remaining > 0) {
        var picked = -1
        // lazy-refresh pop: stale entries are re-inserted with the current
        // D_rest so the min really is the minimum (Eq. 4)
        while (picked < 0 && heap.nonEmpty) {
          val (d, lv) = heap.dequeue()
          if (!expanded.get(lv) && unalloc(lv) > 0) {
            if (d == unalloc(lv)) picked = lv
            else heap.enqueue((unalloc(lv), lv))
          }
        }
        if (picked < 0) picked = nextUnallocatedVertex() // random restart
        expand(picked)
      }
      p += 1
    }
    require(remaining == 0, s"sequential NE left $remaining edges unallocated")
    out
  }
}
