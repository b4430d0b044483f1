package repro.eval

import repro.SparkSpec
import repro.core.Profile

class MatchFunctionsSpec extends SparkSpec {

  import MatchFunctions._

  test("editDistance of identical strings is 0") {
    assert(editDistance("kitten", "kitten") === 0)
  }

  test("editDistance classic example kitten→sitting") {
    assert(editDistance("kitten", "sitting") === 3)
  }

  test("editDistance against empty string is the length") {
    assert(editDistance("", "abc") === 3)
    assert(editDistance("abc", "") === 3)
  }

  test("editDistance is symmetric") {
    assert(editDistance("flaw", "lawn") === editDistance("lawn", "flaw"))
  }

  test("editDistance of a single substitution is 1") {
    assert(editDistance("smith", "smyth") === 1)
  }

  test("editDistance satisfies the triangle inequality on samples") {
    val (a, b, c) = ("carl brown", "carl browne", "karl brown")
    assert(editDistance(a, c) <= editDistance(a, b) + editDistance(b, c))
  }

  test("jaccard of identical token sets is 1") {
    assert(jaccard("a b c", "c b a") === 1.0)
  }

  test("jaccard of disjoint token sets is 0") {
    assert(jaccard("a b", "c d") === 0.0)
  }

  test("jaccard of half-overlapping sets") {
    assert(jaccard("a b", "b c") === 1.0 / 3.0)
  }

  test("jaccard of two empty strings is 1") {
    assert(jaccard("", "") === 1.0)
  }

  test("jaccard ignores repeated tokens") {
    assert(jaccard("a a b", "a b b") === 1.0)
  }

  test("match functions run on profiles without throwing") {
    val p1 = Profile(0, 0, Vector("a" -> "ellen smith", "b" -> "tailor"))
    val p2 = Profile(1, 0, Vector("a" -> "ellen smyth tailor"))
    EditDistanceFn.run(p1, p2)
    JaccardFn.run(p1, p2)
    assert(EditDistanceFn.name === "edit-dist")
    assert(JaccardFn.name === "jaccard-sim")
  }
}
