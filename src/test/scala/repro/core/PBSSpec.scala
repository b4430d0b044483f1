package repro.core

import repro.SparkSpec
import repro.blocking.{ProfileIndex, TokenBlocking}

class PBSSpec extends SparkSpec {

  private val pc = PaperExample.pc
  private val pi = ProfileIndex.build(TokenBlocking.build(pc))
  private val pbs = new PBS(pc, pi)

  // hand-derived processing order (see PaperExample):
  //   b0 baker{3,4} b1 brown b2 carl b3 ellen{0,1} b4 smith{0,1,2}
  //   b5 tailor b6 white{0..5}

  test("the first emission is the pair of the smallest block") {
    val first = pbs.emissions.next()
    assert(first.pair === ((3, 4)))
    assert(math.abs(first.weight - PaperExample.arcs34) < 1e-12)
  }

  test("the first four emissions are hand-derived") {
    assert(pbs.emissions.take(4).map(_.pair).toVector ===
      Vector((3, 4), (0, 1), (0, 2), (1, 2)))
  }

  test("the four matching pairs are exactly the first four emissions") {
    assert(pbs.emissions.take(4).map(_.pair).toSet === PaperExample.gt.pairs)
  }

  test("LeCoBI discards repeated comparisons: blocks 1, 2, 5 emit nothing") {
    assert(pbs.blockComparisons(1).isEmpty)  // brown: (3,4) seen in baker
    assert(pbs.blockComparisons(2).isEmpty)  // carl
    assert(pbs.blockComparisons(5).isEmpty)  // tailor: all pairs seen in smith
  }

  test("the white block emits the remaining 11 pairs at weight 1/15") {
    val w = pbs.blockComparisons(6)
    assert(w.size === 11)
    w.foreach(c => assert(math.abs(c.weight - PaperExample.arcsWhiteOnly) < 1e-12))
  }

  test("no repeated emissions over the full stream") {
    val ps = pbs.emissions.map(_.pair).toVector
    assert(ps.distinct.size === ps.size)
  }

  test("same eventual quality: emits exactly the distinct block pairs") {
    val expected = TokenBlocking.build(pc).blocks.flatMap(_.pairs(pc)).toSet
    assert(pbs.emissions.map(_.pair).toSet === expected)
  }

  test("within every block, weights are non-increasing") {
    for (k <- pi.orderedBlocks.indices) {
      val ws = pbs.blockComparisons(k).map(_.weight)
      if (ws.nonEmpty)
        assert(ws.zip(ws.tail).forall { case (a, b) => a >= b }, s"block $k")
    }
  }

  test("Clean-clean ER: PBS emits cross-source pairs only") {
    val cc = ProfileCollection(
      Vector(
        Profile(0, 1, Vector("a" -> "t u")),
        Profile(1, 1, Vector("a" -> "t")),
        Profile(2, 2, Vector("a" -> "t u"))),
      CleanCleanEr)
    val p = new PBS(cc, ProfileIndex.build(TokenBlocking.build(cc)))
    val ps = p.emissions.toVector
    ps.foreach(c => assert(cc.source(c.i) != cc.source(c.j)))
    assert(ps.map(_.pair).toSet === Set((0, 2), (1, 2)))
  }
}
