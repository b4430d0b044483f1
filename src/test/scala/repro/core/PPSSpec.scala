package repro.core

import repro.SparkSpec
import repro.blocking.{ProfileIndex, TokenBlocking}

class PPSSpec extends SparkSpec {

  private val pc = PaperExample.pc
  private val pi = ProfileIndex.build(TokenBlocking.build(pc))
  private val pps = new PPS(pc, pi)

  // hand-derived duplication likelihoods (avg incident ARCS weight):
  //   p3 = p4 = (46/15 + 4/15)/5 = 2/3      p0 = p1 = (26/15+11/15+3/15)/5
  //   p2 = (11/15+11/15+3/15)/5 = 1/3       p5 = 1/15

  test("the Sorted Profile List ranks {3,4} first, then {0,1}, then 2, then 5") {
    val spl = pps.initialize().sortedProfileList
    assert(spl.take(2).toSet === Set(3, 4))
    assert(spl.slice(2, 4).toSet === Set(0, 1))
    assert(spl(4) === 2)
    assert(spl(5) === 5)
  }

  test("initialization emits each node's top comparison, deduplicated and sorted") {
    // node tops: 0→c01, 1→c01, 2→c02, 3→c34, 4→c34, 5→c05 (smallest pair of
    // the all-equal white edges) → dedup {c34, c01, c02, c05} sorted by weight
    val top = pps.initialize().topComparisons
    assert(top.map(_.pair) === Vector((3, 4), (0, 1), (0, 2), (0, 5)))
  }

  test("the first three emissions are all matching pairs") {
    assert(pps.emissions.take(3).map(_.pair).toSet.subsetOf(PaperExample.gt.pairs))
  }

  test("checkedEntities suppresses pairs of already-processed profiles") {
    // when profile 0 is reached in the SPL, 3 and 4 are checked and c01/c02
    // were emitted at init → profile 0 contributes nothing new except c05
    // (already emitted at init too); full hand-derived stream:
    val all = pps.emissions.map(_.pair).toVector
    // init: c34 c01 c02 c05 | p3: c03 c13 c23 c35 | p4: c04 c14 c24 c45
    // (3 and 4 may swap — equal likelihood) | p0/p1: c12 c15 | p2: c25
    assert(all.take(4) === Vector((3, 4), (0, 1), (0, 2), (0, 5)))
    assert(all.slice(4, 12).toSet === Set(
      (0, 3), (1, 3), (2, 3), (3, 5), (0, 4), (1, 4), (2, 4), (4, 5)))
    assert(all.slice(12, 14) === Vector((1, 2), (1, 5)))
    assert(all(14) === ((2, 5)))
    assert(all.size === 15)
  }

  test("no repeated emissions") {
    val ps = pps.emissions.map(_.pair).toVector
    assert(ps.distinct.size === ps.size)
  }

  test("kMax large enough → same eventual quality as the blocking graph") {
    val expected = TokenBlocking.build(pc).blocks.flatMap(_.pairs(pc)).toSet
    assert(pps.emissions.map(_.pair).toSet === expected)
  }

  test("kMax truncates the per-profile emissions") {
    val truncated = new PPS(pc, pi, kMax = 1)
    val all = truncated.emissions.map(_.pair).toVector
    assert(all.size < pps.emissions.size)
    // still starts with the init comparisons
    assert(all.take(4) === Vector((3, 4), (0, 1), (0, 2), (0, 5)))
  }

  test("duplication likelihood ranks duplicated profiles above singletons") {
    val spl = pps.initialize().sortedProfileList
    assert(spl.indexOf(5) === spl.size - 1) // the only non-duplicated profile
  }

  test("Clean-clean ER: PPS emits cross-source pairs only") {
    val cc = ProfileCollection(
      Vector(
        Profile(0, 1, Vector("a" -> "t u")),
        Profile(1, 1, Vector("a" -> "t")),
        Profile(2, 2, Vector("a" -> "t u"))),
      CleanCleanEr)
    val p = new PPS(cc, ProfileIndex.build(TokenBlocking.build(cc)))
    val ps = p.emissions.toVector
    ps.foreach(c => assert(cc.source(c.i) != cc.source(c.j)))
    assert(ps.map(_.pair).toSet === Set((0, 2), (1, 2)))
  }
}
