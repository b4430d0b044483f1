package repro.data

import repro.core._
import repro.eval.ErDataset
import scala.util.Random
import GenUtil._

/** Synthetic analogs of the paper's four *structured* Dirty ER datasets
  * (Table 2). Shapes (|P|, #attrs, |D_P|, |p̄|) mirror the published ones;
  * the noise between duplicates is **character-level** (typos), which is the
  * property the paper identifies as driving similarity-based methods' success
  * on curated data (Sec. 8). Each generator also carries the literature's
  * expert schema-based PSN key (Sec. 7 "Datasets").
  */
object StructuredData {

  private def attr(p: Profile, name: String): String =
    p.attrs.collectFirst { case (n, v) if n == name => v }.getOrElse("")

  /** Assemble profiles from per-cluster variant lists: profiles are shuffled
    * into a deterministic random id order and the ground truth is the
    * transitive closure of each cluster.
    */
  private def assemble(
      name: String,
      rnd: Random,
      clusters: Seq[Seq[Vector[(String, String)]]],
      psnKey: Option[Profile => String]): ErDataset = {
    val flat = clusters.zipWithIndex.flatMap { case (vs, ci) => vs.map(v => (ci, v)) }
    val shuffled = rnd.shuffle(flat)
    val profiles = shuffled.zipWithIndex.map { case ((_, attrs), id) => Profile(id, 0, attrs) }.toVector
    val byCluster = shuffled.zipWithIndex.groupBy(_._1._1).values.map(_.map(_._2))
    val gt = GroundTruth.fromClusters(byCluster.map(_.toSeq).toSeq)
    ErDataset(name, ProfileCollection(profiles, DirtyEr), gt, psnKey)
  }

  // ------------------------------------------------------------------ census

  /** census-like: 841 profiles, 5 attributes, 344 matches, |p̄| ≈ 4.65.
    * Very discriminative surname + near-perfect soundex PSN key; short values
    * give sparse co-occurrence evidence (paper: PSN beats PBS here).
    */
  def census(seed: Long = 11): ErDataset = {
    val rnd = new Random(seed)
    val givens  = vocab(rnd, 100)
    val zips    = Vector.fill(80)(digits(rnd, 5))
    val cities  = vocab(rnd, 30, 2, 4)

    def base(): Vector[(String, String)] = Vector(
      "surname" -> word(rnd, 2, 3),
      "given"   -> pick(rnd, givens),
      "initial" -> ('a' + rnd.nextInt(26)).toChar.toString,
      "zip"     -> pick(rnd, zips),
      "city"    -> pick(rnd, cities))

    def dup(b: Vector[(String, String)]): Vector[(String, String)] = b.map {
      case ("surname", v) =>
        // census-style noise: mostly same-sounding misspellings (soundex
        // unchanged, token changed), occasionally an arbitrary typo
        val v1 = if (rnd.nextDouble() < 0.5) soundexSafeTypo(rnd, v) else v
        "surname" -> maybeTypo(rnd, v1, 0.15)
      case ("given", v)   => "given"   -> maybeTypo(rnd, v, 0.2)
      case ("zip", v) =>
        "zip" -> (if (rnd.nextDouble() < 0.05)
                    v.updated(rnd.nextInt(v.length), ('0' + rnd.nextInt(10)).toChar)
                  else v)
      case kv => kv
    }

    // 230 duplicate pairs + 38 triples + 267 singles = 841 profiles, 344 pairs
    val clusters =
      Seq.fill(230) { val b = base(); Seq(b, dup(b)) } ++
      Seq.fill(38)  { val b = base(); Seq(b, dup(b), dup(b)) } ++
      Seq.fill(267) { Seq(base()) }

    val key: Profile => String = p =>
      Soundex.encode(attr(p, "surname")) + attr(p, "given").take(1) + attr(p, "zip")
    assemble("census", rnd, clusters, Some(key))
  }

  // -------------------------------------------------------------- restaurant

  /** restaurant-like: 864 profiles, 5 attributes, 112 matches, |p̄| = 5.
    * High token overlap between duplicates and non-discriminative city /
    * cuisine attributes; duplicates frequently reorder the name tokens,
    * which breaks the prefix-style schema-based key but not token methods.
    */
  def restaurant(seed: Long = 13): ErDataset = {
    val rnd = new Random(seed)
    val foodWords   = vocab(rnd, 250)
    val streetWords = vocab(rnd, 180)
    val streetTypes = Vector("street", "st", "avenue", "ave", "blvd")
    val cities      = Vector("newyork", "losangeles", "sanfrancisco", "atlanta")
    val cuisines    = Vector("italian", "french", "chinese", "mexican", "indian",
                             "thai", "steak", "seafood", "diner", "bbq")

    def base(): Vector[(String, String)] = {
      val n1 = pick(rnd, foodWords); var n2 = pick(rnd, foodWords)
      while (n2 == n1) n2 = pick(rnd, foodWords)
      Vector(
        "name"    -> s"$n1 $n2",
        "address" -> s"${digits(rnd, 3)} ${pick(rnd, streetWords)} ${pick(rnd, streetTypes)}",
        "city"    -> pick(rnd, cities),
        "phone"   -> s"${digits(rnd, 3)}-${digits(rnd, 3)}-${digits(rnd, 4)}",
        "cuisine" -> pick(rnd, cuisines))
    }

    def dup(b: Vector[(String, String)]): Vector[(String, String)] = b.map {
      case ("name", v) =>
        val ws = v.split(" ")
        val reordered = if (rnd.nextDouble() < 0.4) ws.reverse else ws
        "name" -> reordered.map(w => maybeTypo(rnd, w, 0.25)).mkString(" ")
      case ("address", v) =>
        val parts = v.split(" ")
        val swapped = parts.last match {
          case "street" if rnd.nextDouble() < 0.5 => parts.init :+ "st"
          case "st"     if rnd.nextDouble() < 0.5 => parts.init :+ "street"
          case "avenue" if rnd.nextDouble() < 0.5 => parts.init :+ "ave"
          case "ave"    if rnd.nextDouble() < 0.5 => parts.init :+ "avenue"
          case _                                  => parts
        }
        "address" -> swapped.mkString(" ")
      case ("phone", v) =>
        "phone" -> (if (rnd.nextDouble() < 0.15) v.replace("-", "") else v)
      case kv => kv
    }

    val clusters =
      Seq.fill(112) { val b = base(); Seq(b, dup(b)) } ++
      Seq.fill(640) { Seq(base()) }

    val key: Profile => String = p => attr(p, "name").replace(" ", "") + attr(p, "address").take(3)
    assemble("restaurant", rnd, clusters, Some(key))
  }

  // -------------------------------------------------------------------- cora

  /** cora-like: ~1.3k profiles, 12 attributes, ~17k matches (large
    * equivalence clusters of bibliographic citations), |p̄| ≈ 5.5.
    */
  def cora(seed: Long = 17): ErDataset = {
    val rnd = new Random(seed)
    val authorVocab = vocab(rnd, 300)
    val titleVocab  = vocab(rnd, 800)
    val venueVocab  = vocab(rnd, 80)
    val pubVocab    = vocab(rnd, 20)
    val cityVocab   = vocab(rnd, 30, 2, 4)
    val months      = Vector("january", "february", "march", "april", "may", "june",
                             "july", "august", "september", "october", "november", "december")

    final case class Paper(
        authors: Vector[String], title: Vector[String], venue: Vector[String],
        year: Int, volume: Int, publisher: String, address: String)

    def paper(): Paper = Paper(
      authors  = Vector.fill(2 + rnd.nextInt(3))(authorVocab(zipf(rnd, authorVocab.size, 0.7))),
      title    = Vector.fill(5 + rnd.nextInt(4))(titleVocab(zipf(rnd, titleVocab.size, 0.8))),
      venue    = Vector.fill(2 + rnd.nextInt(2))(pick(rnd, venueVocab)),
      year     = 1980 + rnd.nextInt(20),
      volume   = 1 + rnd.nextInt(40),
      publisher = pick(rnd, pubVocab),
      address  = pick(rnd, cityVocab))

    /** One citation of `pp`: typos, venue abbreviation, attribute dropout. */
    def cite(pp: Paper): Vector[(String, String)] = {
      val b = Vector.newBuilder[(String, String)]
      b += "authors" -> pp.authors.map(a => maybeTypo(rnd, a, 0.15)).mkString(" ")
      b += "title"   -> pp.title.map(t => maybeTypo(rnd, t, 0.12)).mkString(" ")
      if (rnd.nextDouble() < 0.6) {
        val v = if (rnd.nextDouble() < 0.3) pp.venue.map(_.take(3)) else pp.venue
        b += "venue" -> v.mkString(" ")
      }
      if (rnd.nextDouble() < 0.7) b += "year"      -> pp.year.toString
      if (rnd.nextDouble() < 0.35) b += "pages"    -> s"${100 + rnd.nextInt(800)}"
      if (rnd.nextDouble() < 0.3) b += "volume"    -> pp.volume.toString
      if (rnd.nextDouble() < 0.25) b += "publisher" -> pp.publisher
      if (rnd.nextDouble() < 0.25) b += "address"  -> pp.address
      if (rnd.nextDouble() < 0.25) b += "month"    -> pick(rnd, months)
      if (rnd.nextDouble() < 0.2) b += "editor"    -> pick(rnd, authorVocab)
      if (rnd.nextDouble() < 0.2) b += "note"      -> pick(rnd, titleVocab)
      if (rnd.nextDouble() < 0.1) b += "tech"      -> s"tr${digits(rnd, 3)}"
      b.result()
    }

    // 20×35 + 15×20 + 25×10 clusters + 50 singles = 1300 profiles, 15 875 pairs
    val sizes = Seq.fill(20)(35) ++ Seq.fill(15)(20) ++ Seq.fill(25)(10) ++ Seq.fill(50)(1)
    val clusters = sizes.map { sz => val pp = paper(); Seq.fill(sz)(cite(pp)) }

    val key: Profile => String = p =>
      attr(p, "authors").split(" ").headOption.getOrElse("") + attr(p, "year")
    assemble("cora", rnd, clusters, Some(key))
  }

  // -------------------------------------------------------------------- cddb

  /** cddb-like: 9.8k·scale profiles, ~106 distinct attributes (track00..99),
    * 300·scale matches, |p̄| ≈ 18.75 (5 base attributes + ~14 tracks).
    */
  def cddb(scale: Double = 1.0, seed: Long = 19): ErDataset = {
    val rnd = new Random(seed)
    val artistVocab = vocab(rnd, 5000)
    val titleVocab  = vocab(rnd, 8000)
    val trackVocab  = vocab(rnd, 20000)
    val categories  = Vector("blues", "classical", "country", "data", "folk", "jazz",
                             "newage", "reggae", "rock", "soundtrack", "misc")
    val genres      = vocab(rnd, 30)

    val nPairs    = math.max(20, math.round(300 * scale).toInt)
    val nProfiles = math.max(nPairs * 2 + 10, math.round(9800 * scale).toInt)
    val nSingles  = nProfiles - 2 * nPairs

    def base(): Vector[(String, String)] = {
      val nTracks =
        if (rnd.nextDouble() < 0.01) 30 + rnd.nextInt(71) else 6 + rnd.nextInt(16)
      val head = Vector(
        "artist"   -> Vector.fill(1 + rnd.nextInt(2))(artistVocab(zipf(rnd, artistVocab.size, 0.5))).mkString(" "),
        "dtitle"   -> Vector.fill(2 + rnd.nextInt(2))(titleVocab(zipf(rnd, titleVocab.size, 0.5))).mkString(" "),
        "category" -> pick(rnd, categories),
        "genre"    -> pick(rnd, genres),
        "year"     -> (1960 + rnd.nextInt(50)).toString)
      val tracks = Vector.tabulate(nTracks) { t =>
        f"track$t%02d" -> Vector.fill(1 + rnd.nextInt(3))(trackVocab(zipf(rnd, trackVocab.size, 0.5))).mkString(" ")
      }
      head ++ tracks
    }

    def dup(b: Vector[(String, String)]): Vector[(String, String)] = b.flatMap {
      case ("artist", v) => Some("artist" -> v.split(" ").map(w => maybeTypo(rnd, w, 0.3)).mkString(" "))
      case ("dtitle", v) => Some("dtitle" -> v.split(" ").map(w => maybeTypo(rnd, w, 0.3)).mkString(" "))
      case ("genre", v)  => Some("genre" -> (if (rnd.nextDouble() < 0.2) pick(rnd, genres) else v))
      case ("year", v)   => Some("year" -> (if (rnd.nextDouble() < 0.2) (v.toInt + 1).toString else v))
      case (n, v) if n.startsWith("track") =>
        if (rnd.nextDouble() < 0.1) None
        else Some(n -> v.split(" ").map(w => maybeTypo(rnd, w, 0.15)).mkString(" "))
      case kv => Some(kv)
    }

    val clusters =
      Seq.fill(nPairs) { val b = base(); Seq(b, dup(b)) } ++
      Seq.fill(nSingles) { Seq(base()) }

    val key: Profile => String = p => attr(p, "artist").take(4) + attr(p, "dtitle").take(4)
    assemble("cddb", rnd, clusters, Some(key))
  }
}
