package repro.core

import repro.SparkSpec

class SAPSNSpec extends SparkSpec {

  private val pc = PaperExample.pc
  private val nl = NeighborList.build(pc)
  private val sapsn = new SAPSN(pc, nl)

  test("every emission is a valid pair") {
    sapsn.emissions.take(200).foreach(c => assert(pc.validPair(c.i, c.j)))
  }

  test("emissions are canonical (i < j)") {
    sapsn.emissions.take(200).foreach(c => assert(c.i < c.j))
  }

  test("window-1 emissions come first and match the Neighbor List adjacencies") {
    val w1 = (0 until nl.size - 1).flatMap { pos =>
      val a = nl.entries(pos); val b = nl.entries(pos + 1)
      if (pc.validPair(a, b)) Some(Comparison.of(a, b)) else None
    }
    assert(sapsn.emissions.take(w1.size).toSeq === w1)
  }

  test("repeated comparisons are allowed (naïve method)") {
    val all = sapsn.emissions.toVector
    assert(all.size > all.map(_.pair).distinct.size)
  }

  test("same eventual quality: every valid pair is eventually emitted") {
    val all = sapsn.emissions.map(_.pair).toSet
    val expected = (for (i <- 0 until 6; j <- i + 1 until 6) yield (i, j)).toSet
    assert(all === expected)
  }

  test("the stream terminates after the maximal window") {
    assert(sapsn.emissions.size < nl.size * nl.size)
  }

  test("Clean-clean ER: only cross-source pairs are emitted") {
    val cc = ProfileCollection(
      Vector(
        Profile(0, 1, Vector("a" -> "x y")),
        Profile(1, 1, Vector("a" -> "x z")),
        Profile(2, 2, Vector("a" -> "y z"))),
      CleanCleanEr)
    val m = SAPSN(cc)
    m.emissions.foreach(c => assert(cc.source(c.i) != cc.source(c.j)))
  }

  test("a single-profile collection emits nothing") {
    val one = ProfileCollection(Vector(Profile(0, 0, Vector("a" -> "x y z"))), DirtyEr)
    assert(SAPSN(one).emissions.isEmpty)
  }
}
