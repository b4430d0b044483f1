package repro.bench

import repro.SparkSpec
import repro.core._
import repro.data.HeterogeneousData
import repro.eval.{ErDataset, Experiments, Harness}

/** Table 1 — space/time complexity probe. The paper's Table 1 is analytic;
  * this bench verifies the claimed *scaling shape* empirically: doubling the
  * input size must not blow up any method's initialization super-linearly
  * beyond the n·log n / graph-size bounds, and the core data structures grow
  * linearly with |P|.
  */
class ComplexityBench extends SparkSpec {

  private def initTime(m: ProgressiveMethod): Double = {
    val t0 = System.nanoTime()
    val it = m.emissions
    if (it.hasNext) it.next()
    (System.nanoTime() - t0) / 1e6
  }

  private def dataset(scale: Double): ErDataset = HeterogeneousData.freebase(scale)

  test("Table 1: print measured initialization scaling") {
    println("=== Table 1 probe: init time (ms) vs |P| (freebase-like) ===")
    println(f"${"method"}%-9s ${"|P|=s1"}%-10s ${"|P|=s2"}%-10s ${"ratio"}%-7s")
    for ((m1, m2) <- Experiments.heterogeneousMethods(dataset(0.5))
           .zip(Experiments.heterogeneousMethods(dataset(1.0)))) {
      val t1 = initTime(m1); val t2 = initTime(m2)
      println(f"${m1.name}%-9s $t1%-10.1f $t2%-10.1f ${t2 / math.max(t1, 0.1)}%-7.2f")
    }
  }

  test("space: the Neighbor List and Position Index grow linearly with |P|") {
    val small = NeighborList.build(dataset(0.5).pc)
    val large = NeighborList.build(dataset(1.0).pc)
    val ratio = large.size.toDouble / small.size
    assert(ratio > 1.5 && ratio < 2.6, s"NL growth ratio $ratio") // ~2× for 2× profiles
    // Position Index accounts for every placement exactly once at both scales
    for (nl <- Seq(small, large)) {
      val positions = nl.positionIndex.map(_.length.toLong).sum
      assert(positions === nl.size.toLong)
    }
  }

  test("space: the Profile Index grows linearly with |P|") {
    val piS = repro.blocking.TokenBlockingWorkflow.profileIndex(dataset(0.5).pc)
    val piL = repro.blocking.TokenBlockingWorkflow.profileIndex(dataset(1.0).pc)
    def entries(pi: repro.blocking.ProfileIndex, n: Int): Long =
      (0 until n).map(pi.blocksOf(_).length.toLong).sum
    val ratio = entries(piL, dataset(1.0).pc.size).toDouble /
      entries(piS, dataset(0.5).pc.size)
    assert(ratio > 1.4 && ratio < 3.0, s"Profile Index growth ratio $ratio")
  }

  test("time: doubling |P| scales no method's init catastrophically") {
    for ((m1, m2) <- Experiments.heterogeneousMethods(dataset(0.5))
           .zip(Experiments.heterogeneousMethods(dataset(1.0)))) {
      val t1 = math.max(initTime(m1), 5.0) // floor: timer noise on tiny inputs
      val t2 = initTime(m2)
      assert(t2 < t1 * 30 + 3000, s"${m1.name}: $t1 ms → $t2 ms")
    }
  }

  test("emission is far cheaper than initialization for the advanced methods") {
    val ds = dataset(1.0)
    for (m <- Experiments.heterogeneousMethods(ds) if m.name != "SA-PSAB") {
      val it = m.emissions
      val t0 = System.nanoTime(); if (it.hasNext) it.next()
      val init = System.nanoTime() - t0
      var k = 0
      val t1 = System.nanoTime()
      while (k < 200 && it.hasNext) { it.next(); k += 1 }
      val perEmission = (System.nanoTime() - t1).toDouble / math.max(k, 1)
      assert(perEmission < math.max(init.toDouble, 1e6), s"${m.name}")
    }
  }
}
