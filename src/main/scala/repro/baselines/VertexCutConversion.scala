package repro.baselines

import repro.graph.Hashing

/** Vertex-partition → edge-partition conversion used by the paper to
  * compare against vertex partitioners (ParMETIS, Spinner, XtraPuLP):
  * "each edge is randomly assigned to one of its adjacent vertices'
  * partitions" (Bourse et al. KDD'14). The coin is a deterministic hash of
  * the edge so the conversion is reproducible.
  */
object VertexCutConversion {

  def toEdgePartition(edges: Array[(Long, Long)],
                      labelOf: Long => Int,
                      seed: Long = 7L): Array[Int] =
    edges.map { case (u, v) =>
      val pu = labelOf(u); val pv = labelOf(v)
      if (pu == pv) pu
      else if ((Hashing.mix64(seed ^ Hashing.mix64(u) ^ v) & 1L) == 0L) pu
      else pv
    }

  def fromVertexPartition(vp: LabelPropagation.VertexPartition,
                          edges: Array[(Long, Long)], seed: Long = 7L): Array[Int] =
    toEdgePartition(edges, x => vp.labels(vp.st.vertexIndex.get(x)), seed)

  def fromMultilevel(vp: MultilevelVertex.VertexPartition,
                     edges: Array[(Long, Long)], seed: Long = 7L): Array[Int] =
    toEdgePartition(edges, x => vp.labels(vp.st.vertexIndex.get(x)), seed)
}
