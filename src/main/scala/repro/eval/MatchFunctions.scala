package repro.eval

import repro.core.Profile

/** The two match functions of the time-efficiency study (Sec. 7.3):
  * an *expensive* one — edit distance, O(s·t) — and a *cheap* one — Jaccard
  * token similarity, O(s+t). As in the paper (footnote 10), the functions
  * are executed to charge their runtime, while the matching verdict itself
  * is taken from the ground truth.
  */
object MatchFunctions {

  /** Levenshtein edit distance between the profiles' full texts (O(s·t)). */
  def editDistance(a: String, b: String): Int = {
    val s = a; val t = b
    if (s.isEmpty) return t.length
    if (t.isEmpty) return s.length
    var prev = Array.tabulate(t.length + 1)(identity)
    var curr = new Array[Int](t.length + 1)
    var i = 1
    while (i <= s.length) {
      curr(0) = i
      var j = 1
      while (j <= t.length) {
        val cost = if (s.charAt(i - 1) == t.charAt(j - 1)) 0 else 1
        curr(j) = math.min(math.min(curr(j - 1) + 1, prev(j) + 1), prev(j - 1) + cost)
        j += 1
      }
      val tmp = prev; prev = curr; curr = tmp
      i += 1
    }
    prev(t.length)
  }

  /** Jaccard similarity of the whitespace token sets (O(s+t)). */
  def jaccard(a: String, b: String): Double = {
    val sa = a.split("\\s+").filter(_.nonEmpty).toSet
    val sb = b.split("\\s+").filter(_.nonEmpty).toSet
    if (sa.isEmpty && sb.isEmpty) 1.0
    else {
      val inter = sa.intersect(sb).size
      inter.toDouble / (sa.size + sb.size - inter)
    }
  }

  /** A match function executable against profile pairs, for timing runs. */
  sealed trait MatchFn {
    def name: String
    /** Execute the similarity computation (result value discarded). */
    def run(a: Profile, b: Profile): Unit
  }

  /** Expensive match function (edit distance over full profile text). */
  case object EditDistanceFn extends MatchFn {
    val name = "edit-dist"
    def run(a: Profile, b: Profile): Unit = { editDistance(a.text, b.text); () }
  }

  /** Cheap match function (Jaccard over full profile text tokens). */
  case object JaccardFn extends MatchFn {
    val name = "jaccard-sim"
    def run(a: Profile, b: Profile): Unit = { jaccard(a.text, b.text); () }
  }
}
