package repro.blocking

/** Meta-blocking weighting schemes over the Blocking Graph (Sec. 3.2):
  * the weight of edge (i, j) is derived exclusively from the blocks the two
  * profiles share. Every scheme here decomposes into a per-shared-block
  * contribution plus an optional final normalization, so PBS/PPS can
  * accumulate it incrementally while scanning blocks.
  */
trait BlockWeighting {
  def name: String

  /** Contribution of one shared block of cardinality `card`. */
  def perBlock(card: Long): Double

  /** Final normalization of the accumulated sum (identity by default). */
  def combine(sum: Double, i: Int, j: Int, pi: ProfileIndex): Double = sum

  /** Full edge weight of (i, j) via the Profile Index merge. */
  final def weight(i: Int, j: Int, pi: ProfileIndex): Double =
    combine(pi.sumOverCommonBlocks(i, j)(perBlock), i, j, pi)
}

/** ARCS (Sec. 3.2): Σ 1/||b_k|| over shared blocks — smaller (more
  * distinctive) shared blocks weigh more. The scheme used throughout the
  * paper's experiments.
  */
object Arcs extends BlockWeighting {
  val name = "ARCS"
  def perBlock(card: Long): Double = 1.0 / card
}

/** CBS: plain count of shared blocks. */
object Cbs extends BlockWeighting {
  val name = "CBS"
  def perBlock(card: Long): Double = 1.0
}

/** Jaccard scheme: |B_i ∩ B_j| / |B_i ∪ B_j|. */
object JsScheme extends BlockWeighting {
  val name = "JS"
  def perBlock(card: Long): Double = 1.0
  override def combine(sum: Double, i: Int, j: Int, pi: ProfileIndex): Double = {
    val union = pi.blocksOf(i).length + pi.blocksOf(j).length - sum
    if (union <= 0) 0.0 else sum / union
  }
}
