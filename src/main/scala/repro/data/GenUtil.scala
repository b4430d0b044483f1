package repro.data

import scala.util.Random

/** Deterministic building blocks for the synthetic ER datasets (DESIGN.md §2,
  * "Data substrate"). Everything is a pure function of the caller's `Random`,
  * so a dataset is fully determined by its (scale, seed).
  */
object GenUtil {

  private val consonants = "bcdfghjklmnprstvwz"
  private val vowels     = "aeiou"

  /** A pronounceable synthetic word of `minSyl`..`maxSyl` consonant–vowel
    * syllables — gives realistic alphabetical spread for sorted-neighborhood
    * behaviour without shipping name dictionaries.
    */
  def word(rnd: Random, minSyl: Int = 2, maxSyl: Int = 3): String = {
    val n = minSyl + rnd.nextInt(maxSyl - minSyl + 1)
    val sb = new StringBuilder
    var i = 0
    while (i < n) {
      sb += consonants(rnd.nextInt(consonants.length))
      sb += vowels(rnd.nextInt(vowels.length))
      if (rnd.nextDouble() < 0.3) sb += consonants(rnd.nextInt(consonants.length))
      i += 1
    }
    sb.toString
  }

  /** `size` distinct synthetic words. */
  def vocab(rnd: Random, size: Int, minSyl: Int = 2, maxSyl: Int = 3): Vector[String] = {
    val seen = scala.collection.mutable.LinkedHashSet.empty[String]
    while (seen.size < size) seen += word(rnd, minSyl, maxSyl)
    seen.toVector
  }

  /** One character-level edit: delete, replace, adjacent-swap or insert —
    * the *character-level noise* of the structured datasets (Sec. 8: curated
    * data "principally containing character-level errors").
    */
  def typo(rnd: Random, s: String): String = {
    if (s.length < 2) return s + consonants(rnd.nextInt(consonants.length))
    val pos = rnd.nextInt(s.length)
    rnd.nextInt(4) match {
      case 0 => s.substring(0, pos) + s.substring(pos + 1)                      // delete
      case 1 => s.updated(pos, consonants(rnd.nextInt(consonants.length)))       // replace
      case 2 if pos < s.length - 1 =>                                            // swap
        s.substring(0, pos) + s(pos + 1) + s(pos) + s.substring(pos + 2)
      case _ => s.substring(0, pos) + vowels(rnd.nextInt(vowels.length)) + s.substring(pos) // insert
    }
  }

  /** Apply `typo` with probability `p`. */
  def maybeTypo(rnd: Random, s: String, p: Double): String =
    if (rnd.nextDouble() < p) typo(rnd, s) else s

  /** A soundex-preserving typo: replace a non-leading vowel with a different
    * vowel. Soundex drops all non-leading vowels, so the encoding is
    * unchanged, while the *token* changes — exactly the census-style noise
    * that breaks token equality but not the expert soundex blocking key
    * (and barely perturbs alphabetical order).
    */
  def soundexSafeTypo(rnd: Random, s: String): String = {
    val vowelPos = (1 until s.length).filter(i => vowels.indexOf(s(i)) >= 0)
    if (vowelPos.isEmpty) s
    else {
      val pos = vowelPos(rnd.nextInt(vowelPos.size))
      var v = vowels(rnd.nextInt(vowels.length))
      while (v == s(pos)) v = vowels(rnd.nextInt(vowels.length))
      s.updated(pos, v)
    }
  }

  /** `n` random digits (may start with 0). */
  def digits(rnd: Random, n: Int): String =
    (1 to n).map(_ => ('0' + rnd.nextInt(10)).toChar).mkString

  def pick[T](rnd: Random, xs: IndexedSeq[T]): T = xs(rnd.nextInt(xs.size))

  private val zipfCdfCache =
    scala.collection.mutable.HashMap.empty[(Int, Double), Array[Double]]

  /** Zipf rank: returns k in [0, n) with P(k) ∝ 1/(k+1)^alpha — used for
    * realistic token frequency skew (common words vs rare words). Exact
    * inverse-CDF draw; the CDF is memoized per (n, alpha).
    */
  def zipf(rnd: Random, n: Int, alpha: Double = 1.0): Int = {
    val cdf = zipfCdfCache.synchronized {
      zipfCdfCache.getOrElseUpdate((n, alpha), {
        val w = Array.tabulate(n)(k => 1.0 / math.pow(k + 1.0, alpha))
        val c = new Array[Double](n)
        var s = 0.0
        var k = 0
        while (k < n) { s += w(k); c(k) = s; k += 1 }
        var i = 0
        while (i < n) { c(i) /= s; i += 1 }
        c
      })
    }
    val u = rnd.nextDouble()
    val idx = java.util.Arrays.binarySearch(cdf, u)
    if (idx >= 0) idx else math.min(n - 1, -idx - 1)
  }
}
