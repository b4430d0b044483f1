package repro.eval

import repro.core.{Comparison, GroundTruth}

/** Progressive-recall metrics of Sec. 7 ("Metrics").
  *
  * The horizontal axis is the normalized number of emitted comparisons
  * `ec* = ec / |D_P|`; the ideal method reaches recall 1 at `ec* = 1`.
  * `AUC@ec*` is the area under the recall-vs-ec* curve up to `ec*`, and
  * `AUC*@ec*` normalizes it by the ideal method's area, landing in [0, 1].
  */
object Metrics {

  /** Recall after each emission: `curve(k)` = recall after k+1 emissions.
    * A repeated emission of an already-found match does not increase recall.
    */
  def recallCurve(emissions: Iterator[Comparison], gt: GroundTruth, maxEmissions: Int): Array[Double] = {
    val found = scala.collection.mutable.HashSet.empty[(Int, Int)]
    val out = new scala.collection.mutable.ArrayBuffer[Double](math.min(maxEmissions, 1 << 20))
    val it = emissions
    var k = 0
    val total = gt.size.toDouble
    while (k < maxEmissions && it.hasNext) {
      val c = it.next()
      if (gt.isMatch(c.i, c.j)) found += c.pair
      out += found.size / total
      k += 1
    }
    out.toArray
  }

  /** AUC@ecStar of a recall curve (curve(k) = recall after emission k+1).
    *
    * Discrete integral: each emission contributes `recall_k / |D_P|` of area
    * on the ec* axis. A curve shorter than `ecStar·|D_P|` (method terminated)
    * is padded flat with its final recall, matching a terminated method whose
    * recall stays constant.
    */
  def auc(curve: Array[Double], gtSize: Int, ecStar: Double): Double = {
    val needed = math.round(ecStar * gtSize).toInt
    var s = 0.0
    var k = 0
    val last = if (curve.isEmpty) 0.0 else curve(curve.length - 1)
    while (k < needed) {
      s += (if (k < curve.length) curve(k) else last)
      k += 1
    }
    s / gtSize
  }

  /** The ideal method's AUC@ecStar: recall k/|D_P| for the first |D_P|
    * emissions, then 1.
    */
  def aucIdeal(gtSize: Int, ecStar: Double): Double = {
    val needed = math.round(ecStar * gtSize).toInt
    var s = 0.0
    var k = 1
    while (k <= needed) {
      s += math.min(1.0, k.toDouble / gtSize)
      k += 1
    }
    s / gtSize
  }

  /** Normalized AUC*@ecStar = AUC@ecStar / AUC_ideal@ecStar ∈ [0, 1]. */
  def aucStar(curve: Array[Double], gtSize: Int, ecStar: Double): Double =
    auc(curve, gtSize, ecStar) / aucIdeal(gtSize, ecStar)
}
