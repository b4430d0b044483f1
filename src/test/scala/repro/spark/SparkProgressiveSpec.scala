package repro.spark

import repro.SparkSpec
import repro.blocking.TokenBlockingWorkflow
import repro.core._
import repro.data.StructuredData
import repro.eval.Metrics

class SparkProgressiveSpec extends SparkSpec {

  test("end-to-end distributed PBS equals the driver-side PBS on census") {
    val ds = StructuredData.census()
    val orderedDf = SparkProgressive.pbs(spark, ds.pc)
    val sparkPairs = SparkProgressive.emissions(orderedDf).map(_.pair).toVector
    val local = new PBS(ds.pc, TokenBlockingWorkflow.profileIndex(ds.pc))
    val localPairs = local.emissions.map(_.pair).toVector
    assert(sparkPairs.toSet === localPairs.toSet)
    assert(sparkPairs.size === localPairs.size) // no repeats on either side
  }

  test("distributed PBS recall progressiveness tracks the local one") {
    val ds = StructuredData.census()
    val sparkCurve = Metrics.recallCurve(
      SparkProgressive.emissions(SparkProgressive.pbs(spark, ds.pc)), ds.gt, 3 * ds.gt.size)
    val localCurve = Metrics.recallCurve(
      new PBS(ds.pc, TokenBlockingWorkflow.profileIndex(ds.pc)).emissions, ds.gt, 3 * ds.gt.size)
    // identical pair sets per block ⇒ nearly identical curves; allow a small
    // divergence from floating-point tie reordering inside blocks
    assert(math.abs(sparkCurve.last - localCurve.last) < 0.05)
    val aucS = Metrics.aucStar(sparkCurve, ds.gt.size, 3.0)
    val aucL = Metrics.aucStar(localCurve, ds.gt.size, 3.0)
    assert(math.abs(aucS - aucL) < 0.05, s"spark=$aucS local=$aucL")
  }

  test("end-to-end distributed GS-PSN matches the driver-side GS-PSN") {
    val pc = PaperExample.pc
    val sparkPairs = SparkProgressive.emissions(SparkProgressive.gsPsn(spark, pc, wMax = 4))
      .map(_.pair).toVector
    val localPairs = new GSPSN(pc, NeighborList.build(pc), wMax = 4)
      .globalComparisons().map(_.pair).toVector
    assert(sparkPairs.toSet === localPairs.toSet)
  }

  test("emissions iterator preserves the DataFrame order") {
    val pc = PaperExample.pc
    val df = SparkProgressive.gsPsn(spark, pc, wMax = 4)
    val fromDf = df.collect().map(r => (r.getInt(0), r.getInt(1))).toVector
    val fromIt = SparkProgressive.emissions(df).map(_.pair).toVector
    assert(fromIt === fromDf)
  }

  test("distributed PBS on a Clean-clean dataset emits cross-source pairs only") {
    val ds = repro.data.HeterogeneousData.movies(0.005)
    val it = SparkProgressive.emissions(SparkProgressive.pbs(spark, ds.pc))
    it.take(500).foreach(c => assert(ds.pc.source(c.i) != ds.pc.source(c.j)))
  }
}
