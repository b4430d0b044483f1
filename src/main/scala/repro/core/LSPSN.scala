package repro.core

import scala.collection.mutable

/** Shared window-scan machinery for the weighted Neighbor List methods
  * (LS-PSN / GS-PSN, Sec. 5.1).
  */
private[core] object WindowScan {

  /** Profiles iterated by the outer loop of Algorithm 1: all profiles for
    * Dirty ER, only the P1 side for Clean-clean ER (Sec. 5.1.1).
    */
  def scanIds(pc: ProfileCollection): Vector[Int] = pc.source1Ids

  /** Is `j` a valid neighbor while scanning `i`? Dirty ER requires `j < i`
    * (each pair counted from the larger id, avoiding double counting);
    * Clean-clean ER requires `j` to be on the other source.
    */
  def validNeighbor(pc: ProfileCollection, i: Int, j: Int): Boolean = pc.erType match {
    case DirtyEr      => j < i
    case CleanCleanEr => pc.source(j) != pc.source(i)
  }

  /** Count, for profile `i`, the co-occurrence frequency of every valid
    * neighbor over the window sizes `[wLo, wHi]` (both directions from every
    * position of `i`, as in Algorithm 1 lines 8–16).
    */
  def neighborFrequencies(
      pc: ProfileCollection,
      nl: NeighborList,
      i: Int,
      wLo: Int,
      wHi: Int): mutable.LinkedHashMap[Int, Int] = {
    val freq = mutable.LinkedHashMap.empty[Int, Int]
    val positions = nl.positionsOf(i)
    var pi = 0
    while (pi < positions.length) {
      val pos = positions(pi)
      var w = wLo
      while (w <= wHi) {
        val after = pos + w
        if (after < nl.size) {
          val j = nl.entries(after)
          if (validNeighbor(pc, i, j)) freq.update(j, freq.getOrElse(j, 0) + 1)
        }
        val before = pos - w
        if (before >= 0) {
          val k = nl.entries(before)
          if (validNeighbor(pc, i, k)) freq.update(k, freq.getOrElse(k, 0) + 1)
        }
        w += 1
      }
      pi += 1
    }
    freq
  }

  /** Weight the counted neighbors of `i` with the scheme and return the
    * comparisons (Algorithm 1 lines 17–19).
    */
  def weighted(
      nl: NeighborList,
      scheme: NlWeighting,
      i: Int,
      freq: mutable.LinkedHashMap[Int, Int],
      windows: Int): Iterator[Comparison] = {
    val lenI = nl.positionsOf(i).length
    freq.iterator.map { case (j, f) =>
      Comparison.of(i, j, scheme.weight(f, lenI, nl.positionsOf(j).length, windows))
    }
  }
}

/** Local Schema-Agnostic PSN (Sec. 5.1.1, Algorithms 1 and 2).
  *
  * For each window size w (starting at 1), every comparison found at distance
  * w in the Neighbor List is weighted with the RCF scheme via the Position
  * Index, sorted in descending weight, and emitted; when the window's
  * Comparison List is exhausted the window grows. The order is *local* to a
  * window, so a pair may be re-emitted under a later window — the drawback
  * GS-PSN removes.
  */
final class LSPSN(
    pc: ProfileCollection,
    nl: NeighborList,
    scheme: NlWeighting = Rcf) extends ProgressiveMethod {
  val name = "LS-PSN"

  /** The sorted Comparison List of one window size (Algorithm 1 for w). */
  def windowComparisons(w: Int): Vector[Comparison] =
    WindowScan.scanIds(pc).iterator.flatMap { i =>
      WindowScan.weighted(nl, scheme, i, WindowScan.neighborFrequencies(pc, nl, i, w, w), 1)
    }.toVector.sorted(Comparison.byDescendingWeight)

  def emissions: Iterator[Comparison] =
    Iterator.from(1).takeWhile(_ < nl.size).flatMap(w => windowComparisons(w).iterator)
}

object LSPSN {
  def apply(pc: ProfileCollection, scheme: NlWeighting = Rcf, seed: Int = 42): LSPSN =
    new LSPSN(pc, NeighborList.build(pc, seed), scheme)
}

/** Global Schema-Agnostic PSN (Sec. 5.1.2).
  *
  * Same machinery as LS-PSN, but the co-occurrence frequencies are
  * accumulated over *all* window sizes in `[1, w_max]` before weighting, and
  * the resulting Comparison List is sorted once, globally. Each pair is
  * emitted at most once; the stream ends when the list is exhausted.
  *
  * `maxComparisons` reproduces the paper's footnote 9: on freebase, GS-PSN's
  * Comparison List had to be limited to the available memory (80 GB), which
  * truncated its window range and capped its final recall below 20 %. Since
  * every window contributes up to |NL| comparisons, a budget of `c` stored
  * comparisons bounds the usable window range to ~`c / |NL|`.
  */
final class GSPSN(
    pc: ProfileCollection,
    nl: NeighborList,
    wMax: Int,
    scheme: NlWeighting = Rcf,
    maxComparisons: Long = Long.MaxValue) extends ProgressiveMethod {
  val name = "GS-PSN"

  /** The window range that fits the comparison budget. */
  def effectiveWMax: Int =
    math.min(wMax.toLong, math.max(1L, maxComparisons / math.max(1, nl.size))).toInt

  /** The single, global Comparison List over windows `[1, effectiveWMax]`. */
  def globalComparisons(): Vector[Comparison] = {
    val w = effectiveWMax
    WindowScan.scanIds(pc).iterator.flatMap { i =>
      WindowScan.weighted(nl, scheme, i, WindowScan.neighborFrequencies(pc, nl, i, 1, w), w)
    }.toVector.sorted(Comparison.byDescendingWeight)
  }

  def emissions: Iterator[Comparison] = globalComparisons().iterator
}

object GSPSN {
  def apply(pc: ProfileCollection, wMax: Int, scheme: NlWeighting = Rcf, seed: Int = 42): GSPSN =
    new GSPSN(pc, NeighborList.build(pc, seed), wMax, scheme)
}
