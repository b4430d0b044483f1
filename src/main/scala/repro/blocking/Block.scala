package repro.blocking

import repro.core.{CleanCleanEr, DirtyEr, ProfileCollection}

/** A block: the set of profiles indexed under one blocking key.
  *
  * @param key      the blocking key (an attribute value token for Token
  *                 Blocking, a suffix for SA-PSAB)
  * @param profiles ascending, distinct profile ids
  */
final case class Block(key: String, profiles: Array[Int]) {

  /** |b| — number of profiles in the block. */
  def size: Int = profiles.length

  /** ||b|| — number of comparisons the block yields under the collection's ER
    * type: n(n-1)/2 for Dirty ER, |b∩P1|·|b∩P2| for Clean-clean ER (Sec. 3).
    */
  def cardinality(pc: ProfileCollection): Long = pc.erType match {
    case DirtyEr =>
      size.toLong * (size - 1) / 2
    case CleanCleanEr =>
      val n1 = profiles.count(pc.source(_) == 1).toLong
      n1 * (size - n1)
  }

  /** The valid comparisons of the block, in deterministic (i, j) order. */
  def pairs(pc: ProfileCollection): Iterator[(Int, Int)] =
    Iterator.range(0, profiles.length).flatMap { x =>
      Iterator.range(x + 1, profiles.length).collect {
        case y if pc.validPair(profiles(x), profiles(y)) => (profiles(x), profiles(y))
      }
    }
}

/** An ordered block collection B with aggregate statistics (Sec. 3). */
final case class BlockCollection(blocks: Vector[Block], pc: ProfileCollection) {

  /** |B| — number of blocks. */
  def size: Int = blocks.size

  /** ||B|| — aggregate cardinality (total comparisons, repeats included). */
  def aggregateCardinality: Long = blocks.iterator.map(_.cardinality(pc)).sum

  /** Mean block size |b̄|. */
  def meanBlockSize: Double =
    if (blocks.isEmpty) 0.0 else blocks.iterator.map(_.size.toLong).sum.toDouble / blocks.size
}
