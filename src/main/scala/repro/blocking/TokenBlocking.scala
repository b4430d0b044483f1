package repro.blocking

import repro.core.{ProfileCollection, Tokenizer}

/** Token Blocking (step 1 of the paper's Token Blocking Workflow, Sec. 7):
  * one block per attribute value token that stems from at least two profiles
  * — a *redundancy-positive* schema-agnostic blocking method, the input of
  * both equality-based progressive methods.
  */
object TokenBlocking {

  /** Build the token block collection of `pc`.
    *
    * Blocks that cannot yield a single executable comparison are dropped:
    * fewer than two profiles for Dirty ER, or all profiles on one source for
    * Clean-clean ER. Blocks are returned in deterministic key order.
    */
  def build(pc: ProfileCollection): BlockCollection = {
    val index = scala.collection.mutable.HashMap.empty[String, scala.collection.mutable.TreeSet[Int]]
    for (p <- pc.profiles; tok <- Tokenizer.profileKeys(p))
      index.getOrElseUpdate(tok, scala.collection.mutable.TreeSet.empty[Int]) += p.id
    val blocks = index.iterator
      .map { case (k, ids) => Block(k, ids.toArray) }
      .filter(_.cardinality(pc) > 0)
      .toVector
      .sortBy(_.key)
    BlockCollection(blocks, pc)
  }
}
