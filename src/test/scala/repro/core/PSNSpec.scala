package repro.core

import repro.SparkSpec

class PSNSpec extends SparkSpec {

  test("soundex encodes the classic examples") {
    assert(Soundex.encode("Robert") === "R163")
    assert(Soundex.encode("Rupert") === "R163")
    assert(Soundex.encode("Smith") === "S530")
    assert(Soundex.encode("Smyth") === "S530")
    assert(Soundex.encode("Ashcraft") === "A261")
    assert(Soundex.encode("Tymczak") === "T522")
    assert(Soundex.encode("Pfister") === "P236")
  }

  test("soundex is typo-tolerant for same-sounding variants") {
    assert(Soundex.encode("jonson") === Soundex.encode("johnson"))
  }

  test("soundex of empty input is 0000") {
    assert(Soundex.encode("") === "0000")
    assert(Soundex.encode("123") === "0000")
  }

  test("PSN places each profile exactly once in its Neighbor List") {
    val psn = new PSN(PaperExample.pc, p => p.attrs.head._2)
    assert(psn.neighborList.size === PaperExample.pc.size)
    for (i <- 0 until PaperExample.pc.size)
      assert(psn.neighborList.positionsOf(i).length === 1)
  }

  test("PSN emissions follow incrementally widened windows") {
    val pcs = ProfileCollection(
      Vector(
        Profile(0, 0, Vector("k" -> "a")),
        Profile(1, 0, Vector("k" -> "b")),
        Profile(2, 0, Vector("k" -> "c")),
        Profile(3, 0, Vector("k" -> "d"))),
      DirtyEr)
    val psn = new PSN(pcs, _.attrs.head._2)
    // sorted by key: a b c d → w=1: (0,1)(1,2)(2,3); w=2: (0,2)(1,3); w=3: (0,3)
    assert(psn.emissions.toVector.map(_.pair) ===
      Vector((0, 1), (1, 2), (2, 3), (0, 2), (1, 3), (0, 3)))
  }

  test("PSN with a discriminative key finds duplicates at window 1") {
    // duplicates share the expert key exactly → adjacent after sorting
    val pcs = ProfileCollection(
      Vector(
        Profile(0, 0, Vector("surname" -> "smith", "zip" -> "11111")),
        Profile(1, 0, Vector("surname" -> "smyth", "zip" -> "11111")),
        Profile(2, 0, Vector("surname" -> "brown", "zip" -> "22222")),
        Profile(3, 0, Vector("surname" -> "browne", "zip" -> "22222"))),
      DirtyEr)
    val key: Profile => String = p =>
      Soundex.encode(p.attrs.head._2) + p.attrs(1)._2
    // window 1 emits 3 pairs (the two duplicate pairs + the run boundary)
    val window1 = new PSN(pcs, key).emissions.take(3).map(_.pair).toSet
    assert(Set((0, 1), (2, 3)).subsetOf(window1))
  }

  test("PSN emits every pair exactly once over the full stream") {
    val psn = new PSN(PaperExample.pc, p => p.attrs.head._2)
    val ps = psn.emissions.map(_.pair).toVector
    assert(ps.size === 15)
    assert(ps.distinct.size === 15)
  }
}
