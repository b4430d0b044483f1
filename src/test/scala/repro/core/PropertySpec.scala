package repro.core

import org.scalacheck.Gen
import org.scalacheck.rng.Seed
import repro.SparkSpec
import repro.blocking.{BlockingGraph, ProfileIndex, TokenBlocking}

/** Cross-method invariants checked on random collections: the *Same Eventual
  * Quality* requirement of Sec. 3.1, repeat-freedom where the paper claims
  * it, and metric sanity.
  *
  * ScalaCheck generators are sampled directly with deterministic seeds (the
  * scalatest–scalacheck bridge artifact is not part of the offline toolchain).
  */
class PropertySpec extends SparkSpec {

  private def samples[T](g: Gen[T], n: Int = 40): Seq[T] =
    (1 to n).flatMap(i => g.apply(Gen.Parameters.default, Seed(i.toLong)))

  private val vocabGen = Gen.oneOf(
    "alpha", "beta", "gamma", "delta", "epsilon", "zeta", "eta", "theta",
    "iota", "kappa", "lam", "mu")

  private val profileGen: Gen[Vector[String]] =
    Gen.nonEmptyListOf(vocabGen).map(_.toVector.distinct)

  private val collectionGen: Gen[ProfileCollection] =
    Gen.choose(2, 12).flatMap { n =>
      Gen.listOfN(n, profileGen).map { tokenLists =>
        ProfileCollection(
          tokenLists.zipWithIndex.map { case (ts, i) =>
            Profile(i, 0, Vector("v" -> ts.mkString(" ")))
          }.toVector,
          DirtyEr)
      }
    }

  private def fullIndex(pc: ProfileCollection): ProfileIndex =
    ProfileIndex.build(TokenBlocking.build(pc))

  test("GS-PSN never repeats a comparison") {
    for (pc <- samples(collectionGen)) {
      val nl = NeighborList.build(pc)
      val ps = new GSPSN(pc, nl, wMax = math.max(1, nl.size)).emissions.map(_.pair).toVector
      assert(ps.distinct.size === ps.size)
    }
  }

  test("PBS never repeats a comparison and covers exactly the block pairs") {
    for (pc <- samples(collectionGen)) {
      val ps = new PBS(pc, fullIndex(pc)).emissions.map(_.pair).toVector
      assert(ps.distinct.size === ps.size)
      val expected = TokenBlocking.build(pc).blocks.flatMap(_.pairs(pc)).toSet
      assert(ps.toSet === expected)
    }
  }

  test("PBS emits the same pair set as the materialized Blocking Graph") {
    for (pc <- samples(collectionGen)) {
      val pi = fullIndex(pc)
      val graph = BlockingGraph.edges(pc, pi).map(_.pair).toSet
      assert(new PBS(pc, pi).emissions.map(_.pair).toSet === graph)
    }
  }

  test("PPS with large kMax never repeats and covers the graph") {
    for (pc <- samples(collectionGen)) {
      val pi = fullIndex(pc)
      val ps = new PPS(pc, pi, kMax = 1000).emissions.map(_.pair).toVector
      assert(ps.distinct.size === ps.size)
      assert(ps.toSet === BlockingGraph.edges(pc, pi).map(_.pair).toSet)
    }
  }

  test("SA-PSN eventually emits every co-occurring pair") {
    for (pc <- samples(collectionGen)) {
      val nl = NeighborList.build(pc)
      if (nl.size > 1) {
        val sapsn = new SAPSN(pc, nl).emissions.map(_.pair).toSet
        val gsAll = new GSPSN(pc, nl, wMax = nl.size).emissions.map(_.pair).toSet
        assert(sapsn === gsAll)
      }
    }
  }

  test("all emissions of every method are valid canonical pairs") {
    for (pc <- samples(collectionGen, 20)) {
      val nl = NeighborList.build(pc)
      val pi = fullIndex(pc)
      val methods = Seq(
        new SAPSN(pc, nl), new SAPSAB(pc, 3), new LSPSN(pc, nl),
        new GSPSN(pc, nl, 5), new PBS(pc, pi), new PPS(pc, pi))
      for (m <- methods; c <- m.emissions.take(300)) {
        assert(c.i < c.j, m.name)
        assert(pc.validPair(c.i, c.j), m.name)
      }
    }
  }

  test("recall curves are monotone and bounded for every method") {
    for (pc <- samples(collectionGen, 20)) {
      val gt = GroundTruth.fromPairs(
        pc.profiles.indices.sliding(2).collect { case Seq(a, b) => (a, b) }.toSeq)
      val nl = NeighborList.build(pc)
      for (m <- Seq(new SAPSN(pc, nl), new PBS(pc, fullIndex(pc)))) {
        val curve = repro.eval.Metrics.recallCurve(m.emissions, gt, 200)
        assert(curve.forall(r => r >= 0.0 && r <= 1.0))
        assert(curve.zip(curve.tail).forall { case (a, b) => a <= b })
      }
    }
  }

  test("AUC* is within [0, 1] for every achievable curve") {
    // an achievable curve gains at most one match (1/|D|) per emission —
    // generate random match/non-match emission sequences and fold them
    val gtSize = 7
    val seqGen = Gen.listOf(Gen.oneOf(true, false))
    for (hits <- samples(seqGen, 40)) {
      var found = 0
      val curve = hits.map { h =>
        if (h && found < gtSize) found += 1
        found.toDouble / gtSize
      }.toArray
      for (e <- Seq(1.0, 5.0, 20.0)) {
        val s = repro.eval.Metrics.aucStar(curve, gtSize, e)
        assert(s >= 0.0 && s <= 1.0 + 1e-9, s"ec*=$e curve=${curve.toSeq}")
      }
    }
  }
}
