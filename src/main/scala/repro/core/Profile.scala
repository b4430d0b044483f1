package repro.core

/** An entity profile: a uniquely identified set of attribute name–value pairs.
  *
  * Profiles are schema-free — `attrs` may hold relational columns, RDF
  * predicates, JSON paths or a single free-text blob; all downstream methods
  * in this reproduction only ever look at the *attribute value tokens*
  * (schema-agnostic blocking keys), never at the attribute names.
  *
  * @param id     dense id in `[0, |P|)`; for Clean-clean ER the two source
  *               collections share one id space
  * @param source 0 for Dirty ER; 1 or 2 for the two sides of Clean-clean ER
  * @param attrs  attribute name–value pairs (names may repeat, e.g. RDF)
  */
final case class Profile(id: Int, source: Int, attrs: Vector[(String, String)]) {

  /** All attribute values concatenated — input to the match functions. */
  def text: String = attrs.map(_._2).mkString(" ")
}

/** The two ER settings of the paper (Sec. 3). */
sealed trait ErType
/** Single collection containing duplicates in itself. */
case object DirtyEr extends ErType
/** Two duplicate-free but overlapping collections; matches only cross-source. */
case object CleanCleanEr extends ErType

/** A profile collection `P` together with its ER setting.
  *
  * Ids are dense (`profiles(i).id == i`) so methods can use flat arrays as
  * indexes — the Position Index and Profile Index of the paper rely on this.
  */
final case class ProfileCollection(profiles: Vector[Profile], erType: ErType) {
  require(
    profiles.iterator.zipWithIndex.forall { case (p, i) => p.id == i },
    "profile ids must be dense and equal to their position")

  /** Number of profiles |P| (for Clean-clean: |P1| + |P2|). */
  def size: Int = profiles.size

  /** source of profile `i` — array-backed for hot loops. */
  private val sourceOf: Array[Int] = profiles.map(_.source).toArray

  def source(i: Int): Int = sourceOf(i)

  /** Is (i, j) a comparison this ER task can ever execute?
    * Dirty ER: any two distinct profiles. Clean-clean ER: cross-source only.
    */
  def validPair(i: Int, j: Int): Boolean =
    i != j && (erType match {
      case DirtyEr      => true
      case CleanCleanEr => sourceOf(i) != sourceOf(j)
    })

  /** Ids on source 1 (Clean-clean) — the side iterated by LS-PSN/GS-PSN. */
  lazy val source1Ids: Vector[Int] = erType match {
    case DirtyEr      => profiles.map(_.id)
    case CleanCleanEr => profiles.filter(_.source == 1).map(_.id)
  }
}

/** Ground truth: the set of duplicate pairs `D_P`, stored canonically (i<j).
  *
  * For Dirty ER with equivalence clusters the pair set is the transitive
  * closure (every within-cluster pair), matching how recall is counted in
  * the paper's experiments.
  */
final case class GroundTruth(pairs: Set[(Int, Int)]) {
  require(pairs.forall { case (i, j) => i < j }, "ground-truth pairs must be canonical (i<j)")

  def size: Int = pairs.size

  def isMatch(i: Int, j: Int): Boolean =
    if (i < j) pairs.contains((i, j)) else pairs.contains((j, i))
}

object GroundTruth {

  /** Build from equivalence clusters (Dirty ER): all within-cluster pairs. */
  def fromClusters(clusters: Seq[Seq[Int]]): GroundTruth = {
    val b = Set.newBuilder[(Int, Int)]
    for (c <- clusters; x <- c; y <- c if x < y) b += ((x, y))
    GroundTruth(b.result())
  }

  /** Build from explicit (possibly unordered) pairs. */
  def fromPairs(ps: Iterable[(Int, Int)]): GroundTruth =
    GroundTruth(ps.iterator.map { case (i, j) => if (i < j) (i, j) else (j, i) }.toSet)
}
