package repro.apps

import repro.core.SubGraphState
import repro.graph.Hashing

/** Deterministic simulator of a synchronous GAS (gather–apply–scatter)
  * engine — the PowerLyra/PowerGraph substrate the paper runs SSSP, WCC and
  * PageRank on in Table 5.
  *
  * The graph is held once (global CSR) with a per-edge partition label; a
  * vertex is *replicated* on every partition holding one of its edges, and
  * one replica (hash-chosen, as in PowerGraph) is the *master*. Per
  * superstep the engine executes the real algorithm and counts exactly:
  *
  *  - local work per partition  = edges scanned by that partition
  *    (+ its replica count for apply/scatter vertex work),
  *  - gather traffic            = partial-aggregate records sent by
  *    non-master replicas to the master,
  *  - scatter traffic           = updated values sent master → mirrors.
  *
  * `ET` is then the [[CostModel]] applied per superstep; `COM` and `WB` are
  * the raw counters. Supports up to 64 partitions (proposer sets are Long
  * bitmasks) — every Table 5/6 configuration uses |P| = 64.
  */
final class GasEngine(edges: Array[(Long, Long)], assign: Array[Int],
                      val numParts: Int, cost: CostModel = CostModel.default) {
  require(edges.length == assign.length, "assignment must cover every edge")
  require(numParts >= 1 && numParts <= 64, s"engine supports 1..64 partitions, got $numParts")
  require(assign.forall(p => p >= 0 && p < numParts), "partition id out of range")

  val st: SubGraphState = SubGraphState.build(0, edges)
  private val n = st.numLocalVertices
  private val m = edges.length

  /** Per-vertex replica partitions (sorted) and hash-chosen master. */
  val replicaParts: Array[Array[Int]] = {
    val masks = new Array[Long](n)
    var e = 0
    while (e < m) {
      val bit = 1L << assign(e)
      masks(st.vertexIndex.get(st.srcs(e))) |= bit
      masks(st.vertexIndex.get(st.dsts(e))) |= bit
      e += 1
    }
    masks.map(maskToParts)
  }
  val master: Array[Int] = Array.tabulate(n) { lv =>
    val reps = replicaParts(lv)
    reps(Hashing.bucket(st.vertexIds(lv), reps.length, salt = 0x3A57E8L))
  }

  /** |E_p| per partition. */
  val edgesPerPart: Array[Long] = {
    val c = new Array[Long](numParts)
    assign.foreach(p => c(p) += 1)
    c
  }
  /** |V(E_p)| per partition. */
  val replicasPerPart: Array[Long] = {
    val c = new Array[Long](numParts)
    replicaParts.foreach(_.foreach(p => c(p) += 1))
    c
  }
  /** Σ_v (replicas(v) − 1) — the mirror count that drives all-active traffic. */
  val totalMirrors: Long = replicaParts.map(_.length.toLong - 1).sum

  private def maskToParts(mask: Long): Array[Int] = {
    val out = new Array[Int](java.lang.Long.bitCount(mask))
    var i = 0; var p = 0; var mm = mask
    while (mm != 0) {
      if ((mm & 1) != 0) { out(i) = p; i += 1 }
      mm >>>= 1; p += 1
    }
    out
  }

  import GasEngine.Stats

  /** Frontier-driven min-propagation: the common core of SSSP (unit
    * weights, as run on PowerLyra) and WCC (min-label flooding).
    *
    * @param init per-vertex initial value; Long.MaxValue = inactive start
    * @return (final values, stats)
    */
  private def minPropagation(app: String, init: Array[Long],
                             initialFrontier: Array[Int],
                             relax: Long => Long): (Array[Long], Stats) = {
    val value = init.clone()
    var frontier = initialFrontier
    val totalWork = new Array[Long](numParts)
    var comBytes = 0L
    var elapsed = 0.0
    var supersteps = 0

    val candidate = new java.util.HashMap[Integer, java.lang.Long]()  // lv -> best proposal
    val proposers = new java.util.HashMap[Integer, java.lang.Long]() // lv -> partition mask

    while (frontier.nonEmpty) {
      supersteps += 1
      val stepWork = new Array[Long](numParts)
      candidate.clear(); proposers.clear()
      frontier.foreach { lv =>
        val send = relax(value(lv))
        var k = st.adjOff(lv)
        while (k < st.adjOff(lv + 1)) {
          val e = st.adjEdge(k)
          val w = if (st.srcs(e) == st.vertexIds(lv)) st.dsts(e) else st.srcs(e)
          val lw: Integer = st.vertexIndex.get(w)
          stepWork(assign(e)) += 1
          if (send < value(lw)) {
            val cur = candidate.get(lw)
            if (cur == null || send < cur.longValue()) candidate.put(lw, java.lang.Long.valueOf(send))
            val mask = proposers.get(lw)
            val bit = 1L << assign(e)
            proposers.put(lw, java.lang.Long.valueOf(if (mask == null) bit else mask | bit))
          }
          k += 1
        }
      }
      // gather: every proposing replica that is not the master ships one
      // partial-aggregate record to the master
      var stepBytes = 0L
      val next = scala.collection.mutable.ArrayBuffer.empty[Int]
      val it = candidate.entrySet().iterator()
      while (it.hasNext) {
        val ent = it.next()
        val lw = ent.getKey.intValue()
        val mask = proposers.get(ent.getKey).longValue()
        val nonMaster = java.lang.Long.bitCount(mask & ~(1L << master(lw)))
        stepBytes += nonMaster * CostModel.RecordBytes
        if (ent.getValue < value(lw)) {
          value(lw) = ent.getValue
          next += lw
          // scatter: master broadcasts the new value to all mirrors
          stepBytes += (replicaParts(lw).length - 1) * CostModel.RecordBytes
          stepWork(master(lw)) += 1
        }
      }
      var p = 0
      var maxWork = 0L
      while (p < numParts) {
        totalWork(p) += stepWork(p)
        if (stepWork(p) > maxWork) maxWork = stepWork(p)
        p += 1
      }
      comBytes += stepBytes
      elapsed += cost.superstepSeconds(maxWork, stepBytes)
      frontier = next.toArray
    }
    (value, Stats(app, supersteps, comBytes, elapsed, balance(totalWork), totalWork))
  }

  /** Single-source shortest path with unit weights from `source`.
    * @return distances indexed by the engine's local vertex ids
    *         (Long.MaxValue = unreachable).
    */
  def sssp(source: Long): (Array[Long], Stats) = {
    require(st.vertexIndex.containsKey(source), s"unknown source vertex $source")
    val ls = st.vertexIndex.get(source)
    val init = Array.fill(n)(Long.MaxValue)
    init(ls) = 0L
    minPropagation("SSSP", init, Array(ls), d => d + 1)
  }

  /** Weakly connected components by min-vertex-id flooding. */
  def wcc(): (Array[Long], Stats) = {
    val init = Array.tabulate(n)(lv => st.vertexIds(lv))
    minPropagation("WCC", init, Array.tabulate(n)(identity), l => l)
  }

  /** PageRank with damping 0.85 over the symmetrized graph. All vertices
    * are active every iteration, so the traffic is the static mirror count
    * both ways; the ranks themselves are computed exactly (and verified
    * against a reference in tests).
    */
  def pageRank(iterations: Int, damping: Double = 0.85): (Array[Double], Stats) = {
    require(iterations >= 1)
    val deg = Array.tabulate(n)(lv => st.adjOff(lv + 1) - st.adjOff(lv))
    var rank = Array.fill(n)(1.0 / math.max(1, n))
    var iter = 0
    while (iter < iterations) {
      val next = Array.fill(n)((1.0 - damping) / math.max(1, n))
      var lv = 0
      while (lv < n) {
        val contrib = if (deg(lv) == 0) 0.0 else damping * rank(lv) / deg(lv)
        var k = st.adjOff(lv)
        while (k < st.adjOff(lv + 1)) {
          val e = st.adjEdge(k)
          val w = if (st.srcs(e) == st.vertexIds(lv)) st.dsts(e) else st.srcs(e)
          next(st.vertexIndex.get(w)) += contrib
          k += 1
        }
        lv += 1
      }
      rank = next
      iter += 1
    }
    // static accounting: every edge is scanned in both directions, every
    // vertex is applied at its master and synced to all mirrors, twice
    // (gather partials in, new rank out)
    val perIterBytes = 2L * totalMirrors * CostModel.RecordBytes
    val workPerIter = Array.tabulate(numParts)(p => 2L * edgesPerPart(p) + replicasPerPart(p))
    val totalWork = workPerIter.map(_ * iterations)
    val maxWork = workPerIter.max
    val elapsed = iterations * cost.superstepSeconds(maxWork, perIterBytes)
    (rank, Stats("PageRank", iterations, perIterBytes * iterations, elapsed,
                 balance(totalWork), totalWork))
  }

  private def balance(work: Array[Long]): Double = {
    val mean = work.map(_.toDouble).sum / work.length
    if (mean == 0) 1.0 else work.max / mean
  }
}

object GasEngine {
  /** Per-application counters: exact communication bytes and per-partition
    * work, plus the modeled elapsed time (see [[CostModel]]).
    */
  final case class Stats(app: String, supersteps: Int, comBytes: Long,
                         elapsedSeconds: Double, workBalance: Double,
                         workPerPart: Array[Long])
}
