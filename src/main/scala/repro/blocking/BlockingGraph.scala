package repro.blocking

import repro.core.{Comparison, ProfileCollection}

/** A materialized Blocking Graph (Sec. 3.2): nodes are profiles, edges are
  * the distinct valid comparisons of a block collection, weighted by a
  * Meta-blocking scheme.
  *
  * The paper stresses that materializing the full graph is impractical at
  * web scale — the progressive methods therefore only ever *traverse* it
  * through the Profile Index. This explicit edge list exists for tests,
  * small datasets and the paper's running example (Fig. 3c).
  */
object BlockingGraph {

  /** All distinct edges with weights, in deterministic order. Each pair is
    * materialized from its least common block (LeCoBI), so no duplicates.
    */
  def edges(
      pc: ProfileCollection,
      pi: ProfileIndex,
      scheme: BlockWeighting = Arcs): Vector[Comparison] = {
    val out = Vector.newBuilder[Comparison]
    var k = 0
    while (k < pi.orderedBlocks.size) {
      val b = pi.orderedBlocks(k)
      b.pairs(pc).foreach { case (i, j) =>
        if (pi.lecobi(i, j) == k) out += Comparison.of(i, j, scheme.weight(i, j, pi))
      }
      k += 1
    }
    out.result()
  }

  /** The weighted neighborhood of node `i` (valid co-occurring profiles). */
  def neighborhood(
      pc: ProfileCollection,
      pi: ProfileIndex,
      i: Int,
      scheme: BlockWeighting = Arcs): Map[Int, Double] = {
    val acc = scala.collection.mutable.HashMap.empty[Int, Double]
    for (bk <- pi.blocksOf(i); j <- pi.orderedBlocks(bk).profiles)
      if (j != i && pc.validPair(i, j))
        acc.update(j, acc.getOrElse(j, 0.0) + scheme.perBlock(pi.cardinalities(bk)))
    acc.iterator.map { case (j, s) => (j, scheme.combine(s, i, j, pi)) }.toMap
  }
}
