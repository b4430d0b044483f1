package repro.blocking

/** Block Purging (step 2 of the Token Blocking Workflow, Sec. 7): discard
  * oversized blocks, which correspond to stop-word-like tokens and ingest
  * noise. The paper's threshold: a block is purged when it involves more than
  * 10 % of the input profiles.
  */
object BlockPurging {

  /** Keep blocks with `|b| <= maxFraction * |P|`. */
  def purge(bc: BlockCollection, maxFraction: Double = 0.1): BlockCollection = {
    val limit = maxFraction * bc.pc.size
    bc.copy(blocks = bc.blocks.filter(_.size <= limit))
  }
}
