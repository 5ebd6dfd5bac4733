package repro.baselines

import repro.core.SubGraphState
import scala.collection.mutable

/** SNE — Streaming Neighbor Expansion (Zhang et al. KDD'17), the
  * bounded-memory variant of NE used in Table 4.
  *
  * The edge stream is consumed in chunks that fit a memory budget; within a
  * chunk every partition continues its neighbor expansion from the vertices
  * it already owns (memberships are carried across chunks, so Condition (5)
  * two-hop absorption still applies), and leftover chunk edges are absorbed
  * by expanding the least-loaded partition from a fresh vertex. This is a
  * faithful simplification of SNE's buffer management (documented in
  * DESIGN.md §3): quality lands between HDRF and offline NE, as in the
  * paper.
  */
object SNE {

  def partition(edges: Array[(Long, Long)], p: Int, chunkEdges: Int,
                alpha: Double = 1.1, seed: Long = 42L): Array[Int] = {
    require(p >= 1 && chunkEdges >= 1)
    val m = edges.length
    val out = new Array[Int](m)
    if (m == 0) return out
    val cap = math.ceil(alpha * m / p).toLong
    val member = new mutable.HashMap[Long, mutable.BitSet]()
    val sizes = new Array[Long](p)

    var chunkStart = 0
    while (chunkStart < m) {
      val chunkEnd = math.min(m, chunkStart + chunkEdges)
      val chunk = java.util.Arrays.copyOfRange(edges, chunkStart, chunkEnd)
      val st = SubGraphState.build(0, chunk)
      val localOut = st.alloc
      val unalloc = st.unallocCount
      var remaining = chunk.length

      def mem(x: Long): mutable.BitSet =
        member.getOrElseUpdate(x, mutable.BitSet.empty)

      def allocate(e: Int, q: Int): Unit = {
        localOut(e) = q
        remaining -= 1
        sizes(q) += 1
        var side = 0
        while (side < 2) {
          val x = if (side == 0) st.srcs(e) else st.dsts(e)
          unalloc(st.vertexIndex.get(x)) -= 1
          mem(x) += q
          side += 1
        }
      }

      /** NE-style expansion of vertex `lv` into `q`, incl. two-hop. The cap
        * is enforced per edge — a hub's neighborhood can exceed a whole
        * partition's capacity at repro scale, and an uncapped expand would
        * wreck the edge balance (skipped edges stay for later seeds).
        */
      def expand(lv: Int, q: Int, boundary: mutable.PriorityQueue[(Int, Int)]): Unit = {
        val fresh = mutable.ArrayBuffer.empty[Int]
        var k = st.adjOff(lv)
        while (k < st.adjOff(lv + 1) && sizes(q) < cap) {
          val e = st.adjEdge(k)
          if (localOut(e) < 0) {
            val other = if (st.srcs(e) == st.vertexIds(lv)) st.dsts(e) else st.srcs(e)
            allocate(e, q)
            fresh += st.vertexIndex.get(other)
          }
          k += 1
        }
        fresh.foreach { lu =>
          var j = st.adjOff(lu)
          while (j < st.adjOff(lu + 1) && sizes(q) < cap) {
            val e = st.adjEdge(j)
            if (localOut(e) < 0) {
              val w = if (st.srcs(e) == st.vertexIds(lu)) st.dsts(e) else st.srcs(e)
              if (mem(w).contains(q)) allocate(e, q)
            }
            j += 1
          }
          if (unalloc(lu) > 0) boundary.enqueue((unalloc(lu), lu))
        }
      }

      // continue each partition's expansion from its carried memberships
      var q = 0
      while (q < p) {
        if (sizes(q) < cap) {
          val boundary = mutable.PriorityQueue.empty[(Int, Int)](
            Ordering.Tuple2[Int, Int].reverse)
          var lv = 0
          while (lv < st.numLocalVertices) {
            if (unalloc(lv) > 0 && mem(st.vertexIds(lv)).contains(q))
              boundary.enqueue((unalloc(lv), lv))
            lv += 1
          }
          while (sizes(q) < cap && boundary.nonEmpty) {
            val (d, cand) = boundary.dequeue()
            if (unalloc(cand) > 0) {
              if (d == unalloc(cand)) expand(cand, q, boundary)
              else boundary.enqueue((unalloc(cand), cand))
            }
          }
        }
        q += 1
      }

      // leftovers: grow a fresh region for the least-loaded partition from a
      // new seed (the streaming analogue of NE's random restart), expanding
      // its boundary min-D_rest-first under a per-seed budget so the regions
      // stay contiguous and balanced
      var cursor = 0
      val seedBudget = math.max(1L, chunk.length.toLong / p)
      while (remaining > 0) {
        while (cursor < st.numLocalVertices && unalloc(cursor) == 0) cursor += 1
        require(cursor < st.numLocalVertices, "SNE lost track of chunk edges")
        val target = {
          val open = (0 until p).filter(sizes(_) < cap)
          if (open.nonEmpty) open.minBy(sizes(_)) else (0 until p).minBy(sizes(_))
        }
        val boundary = mutable.PriorityQueue.empty[(Int, Int)](
          Ordering.Tuple2[Int, Int].reverse)
        val start = sizes(target)
        expand(cursor, target, boundary)
        while (boundary.nonEmpty && sizes(target) - start < seedBudget &&
               sizes(target) < cap && remaining > 0) {
          val (d, cand) = boundary.dequeue()
          if (unalloc(cand) > 0) {
            if (d == unalloc(cand)) expand(cand, target, boundary)
            else boundary.enqueue((unalloc(cand), cand))
          }
        }
      }

      var e = 0
      while (e < chunk.length) { out(chunkStart + e) = localOut(e); e += 1 }
      chunkStart = chunkEnd
    }
    out
  }
}
