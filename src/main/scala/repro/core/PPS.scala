package repro.core

import repro.blocking.{Arcs, BlockWeighting, BlockingGraph, ProfileIndex}
import scala.collection.mutable

/** Progressive Profile Scheduling (Sec. 5.2.2, Algorithms 5 and 6).
  *
  * Entity-centric: every profile gets a *duplication likelihood* — the
  * average weight of its incident Blocking Graph edges — and profiles are
  * processed in decreasing duplication likelihood (the Sorted Profile List).
  *
  * Initialization emits the top-weighted comparison of every node (collected
  * into a set, so none repeats). The emission phase then walks the Sorted
  * Profile List; for each profile it gathers the `kMax` top-weighted
  * comparisons among its not-yet-checked neighbors (checkedEntities skips
  * pairs whose more-reliable endpoint was already processed). Comparisons
  * already emitted during initialization are not re-emitted.
  *
  * `kMax` is not fixed in the paper; it is a constructor parameter here
  * (default 50, large enough for the per-profile match degree of every
  * evaluation dataset — see DESIGN.md §4).
  */
final class PPS(
    pc: ProfileCollection,
    val profileIndex: ProfileIndex,
    scheme: BlockWeighting = Arcs,
    kMax: Int = 50) extends ProgressiveMethod {
  val name = "PPS"

  /** Algorithm 5: duplication likelihoods, Sorted Profile List and the
    * deduplicated set of per-node top comparisons, sorted.
    */
  def initialize(): PPS.Init = {
    val top = mutable.LinkedHashMap.empty[(Int, Int), Comparison]
    val likelihood = mutable.ArrayBuffer.empty[(Int, Double)]
    var i = 0
    while (i < pc.size) {
      val nbrs = BlockingGraph.neighborhood(pc, profileIndex, i, scheme)
      if (nbrs.nonEmpty) {
        var sum = 0.0
        var best: Comparison = null
        for ((j, w) <- nbrs) {
          sum += w
          val c = Comparison.of(i, j, w)
          if (best == null || Comparison.byDescendingWeight.lt(c, best)) best = c
        }
        likelihood += ((i, sum / nbrs.size))
        val prev = top.get(best.pair)
        if (prev.isEmpty) top.update(best.pair, best)
      }
      i += 1
    }
    PPS.Init(
      top.values.toVector.sorted(Comparison.byDescendingWeight),
      likelihood.sortBy { case (id, dl) => (-dl, id) }.map(_._1).toVector)
  }

  def emissions: Iterator[Comparison] = {
    val init = initialize()
    val emittedAtInit = init.topComparisons.iterator.map(_.pair).toSet
    val checked = mutable.HashSet.empty[Int]
    init.topComparisons.iterator ++ init.sortedProfileList.iterator.flatMap { i =>
      checked += i
      val nbrs = BlockingGraph.neighborhood(pc, profileIndex, i, scheme)
      nbrs.iterator
        .collect { case (j, w) if !checked.contains(j) => Comparison.of(i, j, w) }
        .filterNot(c => emittedAtInit.contains(c.pair))
        .toVector
        .sorted(Comparison.byDescendingWeight)
        .take(kMax)
        .iterator
    }
  }
}

object PPS {

  /** Result of the initialization phase (Algorithm 5). */
  final case class Init(
      topComparisons: Vector[Comparison],
      sortedProfileList: Vector[Int])
}
