package repro.core

/** A six-profile Dirty ER fixture modeled on the paper's running example
  * (Fig. 3): a data lake mixing relational, RDF and free-text profiles, with
  * p1 ≡ p2 ≡ p3 and p4 ≡ p5, and one stop-word-like token ("white") shared
  * by all six profiles.
  *
  * All expected intermediate artifacts (blocks, ARCS weights, orders) are
  * hand-computed in the suites that use this fixture:
  *
  * Token blocks (≥2 profiles):
  *   ellen{0,1} smith{0,1,2} tailor{0,1,2} carl{3,4} brown{3,4} baker{3,4}
  *   white{0,1,2,3,4,5}
  * Cardinalities: 1, 3, 3, 1, 1, 1, 15.
  * ARCS: w(0,1)=26/15  w(0,2)=w(1,2)=11/15  w(3,4)=46/15  white-only=1/15.
  */
object PaperExample {

  val profiles: Vector[Profile] = Vector(
    Profile(0, 0, Vector("name" -> "ellen", "surname" -> "smith",
                         "job" -> "tailor", "city" -> "white")),
    Profile(1, 0, Vector("hasName" -> "ellen smith", "work" -> "tailor",
                         "location" -> "white")),
    Profile(2, 0, Vector("person" -> "smith", "profession" -> "tailor",
                         "town" -> "white")),
    Profile(3, 0, Vector("name" -> "carl", "surname" -> "brown",
                         "job" -> "baker", "city" -> "white")),
    Profile(4, 0, Vector("text" -> "carl brown baker white")),
    Profile(5, 0, Vector("text" -> "john white green town")))

  val pc: ProfileCollection = ProfileCollection(profiles, DirtyEr)

  val gt: GroundTruth = GroundTruth.fromClusters(Seq(Seq(0, 1, 2), Seq(3, 4)))

  /** The expected token blocks with ≥ 1 executable comparison. */
  val expectedBlocks: Map[String, Set[Int]] = Map(
    "ellen"  -> Set(0, 1),
    "smith"  -> Set(0, 1, 2),
    "tailor" -> Set(0, 1, 2),
    "carl"   -> Set(3, 4),
    "brown"  -> Set(3, 4),
    "baker"  -> Set(3, 4),
    "white"  -> Set(0, 1, 2, 3, 4, 5))

  /** Hand-computed ARCS weights over the unpurged, unfiltered blocks. */
  val arcs01: Double = 1.0 + 1.0 / 3 + 1.0 / 3 + 1.0 / 15        // ellen smith tailor white
  val arcs02: Double = 1.0 / 3 + 1.0 / 3 + 1.0 / 15              // smith tailor white
  val arcs34: Double = 3.0 + 1.0 / 15                            // carl brown baker white
  val arcsWhiteOnly: Double = 1.0 / 15
}
