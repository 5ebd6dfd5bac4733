package repro.core

import scala.collection.mutable.ArrayBuffer

/** State of one *allocation process* (§3.3/§4 of the paper): the slice of
  * the input graph that 2D-hash placement assigned to this grid cell,
  * stored in CSR, plus the mutable allocation state.
  *
  * Immutable across iterations (shared between copies):
  *  - `srcs`/`dsts`        — the local edge list (canonical undirected)
  *  - `vertexIds`/`vertexIndex` — global↔local vertex id mapping
  *  - `adjOff`/`adjEdge`   — CSR adjacency (each edge appears under both
  *                            endpoints)
  *
  * Mutable per copy (the per-iteration dataflow copies before writing, so a
  * lineage recomputation replays deterministically — see DistributedNE):
  *  - `alloc`        — per-edge partition id, -1 = unallocated
  *  - `memberships`  — per local vertex, the sorted set of partitions it has
  *                      been allocated to (the replicated vertex allocation
  *                      ids the paper synchronises)
  *  - `unallocCount` — per local vertex, its local D_rest (number of local
  *                      unallocated incident edges)
  */
final class SubGraphState(
    val cellId: Int,
    val srcs: Array[Long],
    val dsts: Array[Long],
    val vertexIds: Array[Long],
    val vertexIndex: java.util.HashMap[Long, Int],
    val adjOff: Array[Int],
    val adjEdge: Array[Int],
    val alloc: Array[Int],
    val memberships: Array[Array[Int]],
    val unallocCount: Array[Int]
) extends Serializable {

  def numEdges: Int = srcs.length
  def numLocalVertices: Int = vertexIds.length

  /** Copy-on-write clone: clones the mutable arrays, shares the topology.
    * Membership rows are themselves copy-on-write (see `addMembership`), so
    * a shallow clone of the outer array suffices.
    */
  def copy(): SubGraphState =
    new SubGraphState(cellId, srcs, dsts, vertexIds, vertexIndex, adjOff,
      adjEdge, alloc.clone(), memberships.clone(), unallocCount.clone())

  /** Adds partition `p` to the local replica of vertex `lv`.
    * @return true iff the membership was new locally.
    */
  private def addMembership(lv: Int, p: Int): Boolean = {
    val cur = memberships(lv)
    if (java.util.Arrays.binarySearch(cur, p) >= 0) false
    else {
      val next = new Array[Int](cur.length + 1)
      var i = 0
      while (i < cur.length && cur(i) < p) { next(i) = cur(i); i += 1 }
      next(i) = p
      System.arraycopy(cur, i, next, i + 1, cur.length - i)
      memberships(lv) = next
      true
    }
  }

  private def allocateEdge(e: Int, p: Int, msgs: ArrayBuffer[(Long, Int)]): Unit = {
    alloc(e) = p
    var side = 0
    while (side < 2) {
      val x = if (side == 0) srcs(e) else dsts(e)
      val lx = vertexIndex.get(x)
      unallocCount(lx) -= 1
      if (addMembership(lx, p)) msgs += ((x, p))
      side += 1
    }
  }

  /** Phase 1 — AllocateOneHopNeighbors (Alg. 3): allocate every local
    * unallocated edge incident to a selected vertex. The allocation conflict
    * (both endpoints selected by different partitions) is resolved locally
    * and deterministically: the less-loaded partition wins, ties to the
    * smaller id — the distributed analogue of the paper's CAS.
    *
    * @param sel    selected (vertex → partition), iterated in the caller's
    *               deterministic order via `selOrder`
    * @param sizes  global |E_p| snapshot from the driver (start of iteration)
    * @param delta  per-partition edges allocated locally this iteration
    *               (updated in place; used to keep conflict resolution and
    *               two-hop target choice load-aware within the iteration)
    * @return new vertex→partition membership messages to synchronise
    */
  def allocateOneHop(selOrder: Array[(Long, Int)],
                     sel: java.util.HashMap[java.lang.Long, java.lang.Integer],
                     sizes: Array[Long],
                     delta: Array[Long],
                     quota: Array[Long] = null): ArrayBuffer[(Long, Int)] = {
    val msgs = new ArrayBuffer[(Long, Int)]()
    // Capacity-aware allocation (Eq. 2's constraint enforced *during* the
    // iteration): the driver hands every cell a per-partition quota of
    // ⌈(cap − |E_p|)/A⌉ edges, so even with all A cells allocating
    // concurrently the global overshoot past the cap is at most ~A edges.
    // At repro scale a single hub's neighborhood can exceed the entire
    // per-partition cap, so the paper's unchecked "allocate all one-hop
    // edges" would wreck the edge balance the paper reports (EB ≈ α).
    // An edge whose claimants are all at quota stays unallocated for a
    // later iteration; termination is unaffected because some partition is
    // always below cap while edges remain.
    def feasible(q: Int): Boolean = quota == null || delta(q) < quota(q)
    var i = 0
    while (i < selOrder.length) {
      val (v, p) = selOrder(i)
      if (vertexIndex.containsKey(v)) {
        val lv = vertexIndex.get(v)
        var k = adjOff(lv)
        val end = adjOff(lv + 1)
        while (k < end) {
          val e = adjEdge(k)
          if (alloc(e) < 0) {
            val w = if (srcs(e) == v) dsts(e) else srcs(e)
            val other = sel.get(java.lang.Long.valueOf(w))
            val winner =
              if (other == null || other.intValue() == p) { if (feasible(p)) p else -1 }
              else {
                val q = other.intValue()
                (feasible(p), feasible(q)) match {
                  case (true, false) => p
                  case (false, true) => q
                  case (false, false) => -1
                  case (true, true) =>
                    val loadP = sizes(p) + delta(p)
                    val loadQ = sizes(q) + delta(q)
                    if (loadP < loadQ || (loadP == loadQ && p < q)) p else q
                }
              }
            if (winner >= 0) {
              allocateEdge(e, winner, msgs)
              delta(winner) += 1
            }
          }
          k += 1
        }
      }
      i += 1
    }
    msgs
  }

  /** Phase 2 — SyncVertexAllocations: apply the shuffled membership
    * messages to the local replicas.
    * @return the locally-present synced pairs (deduplicated), i.e. the
    *         local view of BP_new to scan for two-hop allocation.
    */
  def applySync(msgs: Iterator[(Long, Int)]): Array[(Int, Int)] = {
    val seen = new java.util.HashSet[Long]()
    val local = new ArrayBuffer[(Int, Int)]()
    while (msgs.hasNext) {
      val (x, p) = msgs.next()
      if (vertexIndex.containsKey(x)) {
        val lx = vertexIndex.get(x)
        val key = lx.toLong * 0x100000000L + p
        if (seen.add(key)) {
          addMembership(lx, p)
          local += ((lx, p))
        }
      }
    }
    local.toArray
  }

  /** Phase 3 — AllocateTwoHopNeighbors (Alg. 3): for each synced boundary
    * vertex u, allocate each local unallocated edge (u,w) whose endpoints
    * already share a partition; such edges never increase replication
    * (Condition (5)). The target is the least-loaded shared partition.
    */
  def allocateTwoHop(bpNew: Array[(Int, Int)],
                     sizes: Array[Long],
                     delta: Array[Long],
                     quota: Array[Long] = null): Unit = {
    val ignored = new ArrayBuffer[(Long, Int)]() // two-hop adds no memberships
    var i = 0
    while (i < bpNew.length) {
      val lu = bpNew(i)._1
      var k = adjOff(lu)
      val end = adjOff(lu + 1)
      while (k < end) {
        val e = adjEdge(k)
        if (alloc(e) < 0) {
          val u = vertexIds(lu)
          val w = if (srcs(e) == u) dsts(e) else srcs(e)
          val lw = vertexIndex.get(w)
          val pNew = leastLoadedShared(memberships(lu), memberships(lw), sizes, delta, quota)
          if (pNew >= 0) {
            val before = ignored.length
            allocateEdge(e, pNew, ignored)
            // Both endpoints already hold pNew, so no membership can appear.
            assert(ignored.length == before,
              s"two-hop allocation created a membership for edge $e")
            delta(pNew) += 1
          }
        }
        k += 1
      }
      i += 1
    }
  }

  /** argmin load over the intersection of two sorted membership rows;
    * -1 if the intersection is empty. Ties break to the smaller id.
    */
  private def leastLoadedShared(a: Array[Int], b: Array[Int],
                                sizes: Array[Long], delta: Array[Long],
                                quota: Array[Long]): Int = {
    var i = 0; var j = 0
    var best = -1; var bestLoad = Long.MaxValue
    while (i < a.length && j < b.length) {
      if (a(i) < b(j)) i += 1
      else if (a(i) > b(j)) j += 1
      else {
        val p = a(i)
        val load = sizes(p) + delta(p)
        val feasible = quota == null || delta(p) < quota(p)
        if (feasible && load < bestLoad) { best = p; bestLoad = load }
        i += 1; j += 1
      }
    }
    best
  }

  /** Phase 4 — ComputeLocalDrest: the local D_rest for each synced boundary
    * pair. Zero scores are dropped — a vertex with no unallocated edges is
    * not in the boundary B(X) by definition.
    */
  def localDrest(bpNew: Array[(Int, Int)]): Array[(Long, Int, Int)] = {
    val out = new ArrayBuffer[(Long, Int, Int)](bpNew.length)
    var i = 0
    while (i < bpNew.length) {
      val (lx, p) = bpNew(i)
      val d = unallocCount(lx)
      if (d > 0) out += ((vertexIds(lx), p, d))
      i += 1
    }
    out.toArray
  }

  /** Up to `k` local vertices that still have unallocated edges, scanned
    * from a seeded offset so the random restarts are not id-biased.
    * Feeds the driver's random-vertex pool (Alg. 1 line 7).
    */
  def sampleUnallocated(k: Int, seed: Long): Array[Long] = {
    val n = numLocalVertices
    if (n == 0) return Array.empty
    val start = (java.lang.Long.remainderUnsigned(repro.graph.Hashing.mix64(seed ^ cellId), n.toLong)).toInt
    val out = new ArrayBuffer[Long](k)
    var step = 0
    while (step < n && out.length < k) {
      val lv = (start + step) % n
      if (unallocCount(lv) > 0) out += vertexIds(lv)
      step += 1
    }
    out.toArray
  }

  /** Final assignment triples; only valid once every edge is allocated. */
  def assignments: Iterator[(Long, Long, Int)] =
    (0 until numEdges).iterator.map { e =>
      require(alloc(e) >= 0, s"edge $e in cell $cellId left unallocated")
      (srcs(e), dsts(e), alloc(e))
    }
}

object SubGraphState {

  /** Builds the CSR state for one grid cell from its local edge list. */
  def build(cellId: Int, edges: Array[(Long, Long)]): SubGraphState = {
    val m = edges.length
    val srcs = new Array[Long](m)
    val dsts = new Array[Long](m)
    var i = 0
    while (i < m) { srcs(i) = edges(i)._1; dsts(i) = edges(i)._2; i += 1 }

    val vertexIndex = new java.util.HashMap[Long, Int]()
    val ids = new ArrayBuffer[Long]()
    def intern(x: Long): Int =
      if (vertexIndex.containsKey(x)) vertexIndex.get(x)
      else { val nid = ids.length; vertexIndex.put(x, nid); ids += x; nid }
    val lsrc = new Array[Int](m)
    val ldst = new Array[Int](m)
    i = 0
    while (i < m) { lsrc(i) = intern(srcs(i)); ldst(i) = intern(dsts(i)); i += 1 }
    val n = ids.length
    val deg = new Array[Int](n)
    i = 0
    while (i < m) { deg(lsrc(i)) += 1; deg(ldst(i)) += 1; i += 1 }
    val adjOff = new Array[Int](n + 1)
    i = 0
    while (i < n) { adjOff(i + 1) = adjOff(i) + deg(i); i += 1 }
    val cursor = adjOff.clone()
    val adjEdge = new Array[Int](2 * m)
    i = 0
    while (i < m) {
      adjEdge(cursor(lsrc(i))) = i; cursor(lsrc(i)) += 1
      adjEdge(cursor(ldst(i))) = i; cursor(ldst(i)) += 1
      i += 1
    }
    val allocArr = Array.fill(m)(-1)
    val membershipsArr: Array[Array[Int]] = Array.fill(n)(Array.emptyIntArray)
    new SubGraphState(cellId, srcs, dsts, ids.toArray, vertexIndex, adjOff,
      adjEdge, allocArr, membershipsArr, deg)
  }
}
