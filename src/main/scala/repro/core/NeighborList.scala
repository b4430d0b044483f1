package repro.core

import scala.collection.mutable
import scala.util.hashing.MurmurHash3

/** The Neighbor List (Sec. 3.2) and its Position Index (Sec. 5.1).
  *
  * The Neighbor List is the list of profile ids obtained by sorting every
  * (blocking key, profile) placement alphabetically by key. With
  * schema-agnostic keys each profile has one placement per distinct
  * attribute-value token, so it appears multiple times (Fig. 3e).
  *
  * Ties inside a run of equal keys are ordered by a seeded hash of
  * (key, profileId): the paper calls the within-key order "relatively
  * random" (*coincidental proximity*); hashing reproduces that randomness
  * deterministically, so tests and benchmarks are repeatable.
  *
  * @param entries       `entries(pos)` = profile id at Neighbor List position `pos`
  * @param keys          `keys(pos)` = the blocking key that put it there
  * @param positionIndex Position Index: profile id -> ascending positions in `entries`
  */
final class NeighborList private (
    val entries: Array[Int],
    val keys: Array[String],
    val positionIndex: Array[Array[Int]]) {

  /** Number of placements (positions) in the list. */
  def size: Int = entries.length

  /** Positions of profile `i` — empty if the profile produced no tokens. */
  def positionsOf(i: Int): Array[Int] = positionIndex(i)
}

object NeighborList {

  /** Build the Neighbor List of a collection from its attribute value tokens. */
  def build(pc: ProfileCollection, seed: Int = 42): NeighborList =
    fromPlacements(Tokenizer.placements(pc), pc.size, seed)

  /** Build from explicit (key, profileId) placements — used by tests and by
    * the schema-based PSN (single key per profile).
    */
  def fromPlacements(
      placements: Seq[(String, Int)],
      nProfiles: Int,
      seed: Int = 42): NeighborList = {
    val sorted = placements.sortBy { case (k, id) =>
      (k, MurmurHash3.stringHash(s"$k#$id", seed))
    }
    val entries = sorted.iterator.map(_._2).toArray
    val keys    = sorted.iterator.map(_._1).toArray
    val posBuf  = Array.fill(nProfiles)(new mutable.ArrayBuffer[Int](4))
    var pos = 0
    while (pos < entries.length) { posBuf(entries(pos)) += pos; pos += 1 }
    new NeighborList(entries, keys, posBuf.map(_.toArray))
  }
}
