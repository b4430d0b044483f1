package repro.blocking

import repro.SparkSpec
import repro.core.PaperExample

class PurgeFilterSpec extends SparkSpec {

  private val bc = TokenBlocking.build(PaperExample.pc)

  test("purging removes blocks above the size threshold") {
    // 50 % of 6 profiles = 3 → white (6 profiles) is purged, the rest stay
    val purged = BlockPurging.purge(bc, 0.5)
    assert(purged.blocks.map(_.key).toSet ===
      Set("ellen", "smith", "tailor", "carl", "brown", "baker"))
  }

  test("the paper's 10 % threshold purges everything on a 6-profile fixture") {
    // 10 % of 6 = 0.6 < every block size — degenerate by design at toy scale
    assert(BlockPurging.purge(bc, 0.1).blocks.isEmpty)
  }

  test("purging with fraction 1.0 keeps every block") {
    assert(BlockPurging.purge(bc, 1.0).blocks.size === bc.blocks.size)
  }

  test("filtering with ratio 1.0 keeps everything") {
    val f = BlockFiltering.filter(bc, 1.0)
    assert(f.blocks.map(b => b.key -> b.profiles.toSet).toMap === PaperExample.expectedBlocks)
  }

  test("filtering with ratio 0.5 keeps each profile in its smallest blocks") {
    // hand-derived: p0/p1 keep {ellen, smith}; p2 keeps {smith, tailor};
    // p3/p4 keep {baker, brown}; p5 keeps {white};
    // tailor {2}, carl {}, white {5} die (no comparisons)
    val f = BlockFiltering.filter(bc, 0.5)
    assert(f.blocks.map(b => b.key -> b.profiles.toSet).toMap === Map(
      "ellen" -> Set(0, 1),
      "smith" -> Set(0, 1, 2),
      "baker" -> Set(3, 4),
      "brown" -> Set(3, 4)))
  }

  test("filtering keeps at least one block per profile") {
    val f = BlockFiltering.filter(bc, 0.01)
    // every profile appears in at least one of the surviving retained lists
    // (blocks may still die if the partner was filtered away)
    val retainedProfiles = f.blocks.flatMap(_.profiles).toSet
    // p5's only block (white) dies because the other 5 keep their smaller blocks
    assert(retainedProfiles.subsetOf((0 until 6).toSet))
  }

  test("filtering drops blocks left without executable comparisons") {
    val f = BlockFiltering.filter(bc, 0.5)
    assert(f.blocks.forall(_.cardinality(PaperExample.pc) > 0))
  }

  test("workflow composes purge + filter") {
    val wf = TokenBlockingWorkflow.blocks(PaperExample.pc, purgeFraction = 0.5, filterRatio = 1.0)
    assert(wf.blocks.map(_.key).toSet ===
      Set("ellen", "smith", "tailor", "carl", "brown", "baker"))
  }
}
