package repro.blocking

import repro.core.ProfileCollection

/** The full Token Blocking Workflow of the paper's experimental setup
  * (Sec. 7 "Parameter configuration"): schema-agnostic Standard (Token)
  * Blocking → Block Purging (10 %) → Block Filtering (80 %), producing the
  * redundancy-positive block collection whose Blocking Graph (ARCS-weighted)
  * drives PBS and PPS.
  */
object TokenBlockingWorkflow {

  def blocks(
      pc: ProfileCollection,
      purgeFraction: Double = 0.1,
      filterRatio: Double = 0.8): BlockCollection =
    BlockFiltering.filter(BlockPurging.purge(TokenBlocking.build(pc), purgeFraction), filterRatio)

  /** Blocks + Profile Index in PBS processing order. */
  def profileIndex(
      pc: ProfileCollection,
      purgeFraction: Double = 0.1,
      filterRatio: Double = 0.8): ProfileIndex =
    ProfileIndex.build(blocks(pc, purgeFraction, filterRatio))
}
