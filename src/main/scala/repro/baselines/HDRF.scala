package repro.baselines

import scala.collection.mutable

/** HDRF — High-Degree (are) Replicated First (Petroni et al. CIKM'15), the
  * sequential streaming baseline of Table 4.
  *
  * For each streamed edge (u,v) the partition maximising
  * `C_REP(p) + bal · C_BAL(p)` is chosen, where
  * `C_REP(p) = g(u,p) + g(v,p)`, `g(x,p) = [p ∈ A(x)] · (1 + (1 − θ_x))`,
  * `θ_x = d(x)/(d(u)+d(v))` over the *partial* degrees seen so far, and
  * `C_BAL(p) = (maxLoad − load(p)) / (ε + maxLoad − minLoad)`.
  *
  * Sequential on the driver by design — that is the paper's point of
  * comparison (Table 4: good RF, no parallel speed).
  */
object HDRF {

  def partition(edges: Array[(Long, Long)], p: Int,
                balance: Double = 1.1, eps: Double = 1e-3,
                alpha: Double = 1.1, shuffleSeed: Long = 97L): Array[Int] = {
    require(p >= 1)
    val out = new Array[Int](edges.length)
    val replicas = new mutable.HashMap[Long, mutable.BitSet]()
    val degree = new mutable.HashMap[Long, Int]()
    val load = new Array[Long](p)
    var maxLoad = 0L
    var minLoad = 0L
    // HDRF consumes an *unordered* stream; our callers hand over sorted
    // canonical edges, so apply a deterministic permutation first (a sorted
    // stream would hand HDRF artificial locality it does not have in the
    // paper). The hard capacity below is standard in HDRF implementations —
    // without it the replication term snowballs one partition.
    val order = edges.indices.toArray
    val rnd = new java.util.Random(shuffleSeed)
    var j = order.length - 1
    while (j > 0) { val k = rnd.nextInt(j + 1); val t = order(j); order(j) = order(k); order(k) = t; j -= 1 }
    val cap = math.ceil(alpha * edges.length / p).toLong

    var i = 0
    while (i < edges.length) {
      val idx = order(i)
      val (u, v) = edges(idx)
      val du = degree.updateWith(u)(d => Some(d.getOrElse(0) + 1)).get
      val dv = degree.updateWith(v)(d => Some(d.getOrElse(0) + 1)).get
      val thetaU = du.toDouble / (du + dv)
      val thetaV = 1.0 - thetaU
      val au = replicas.getOrElseUpdate(u, mutable.BitSet.empty)
      val av = replicas.getOrElseUpdate(v, mutable.BitSet.empty)
      var best = -1
      var bestScore = Double.NegativeInfinity
      var q = 0
      while (q < p) {
        if (load(q) < cap) {
          val gU = if (au.contains(q)) 1.0 + (1.0 - thetaU) else 0.0
          val gV = if (av.contains(q)) 1.0 + (1.0 - thetaV) else 0.0
          val cBal = (maxLoad - load(q)).toDouble / (eps + (maxLoad - minLoad).toDouble)
          val score = gU + gV + balance * cBal
          if (score > bestScore) { bestScore = score; best = q }
        }
        q += 1
      }
      require(best >= 0, "capacity exhausted — alpha must exceed 1.0")
      out(idx) = best
      au += best; av += best
      load(best) += 1
      if (load(best) > maxLoad) maxLoad = load(best)
      minLoad = load.min // p is small (≤ 1024); fine per edge at repro scale
      i += 1
    }
    out
  }
}
