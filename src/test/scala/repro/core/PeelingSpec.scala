package repro.core

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.{PropSpec, TestGraphs}

class PeelingSpec extends AnyFunSuite with PropSpec {

  private def peel(es: Array[(Long, Long)]): Peeling.Block = {
    val g = LocalGraph.fromEdges(es)
    Peeling.densestBlock(g, DensityMetric.merchantWeights(g))
  }

  test("single edge: the block is that pair") {
    val b = peel(Array((1L, 10L)))
    assert(b.uIds.toSeq == Seq(1L) && b.vIds.toSeq == Seq(10L))
    assert(math.abs(b.score - (1.0 / math.log(6.0)) / 2.0) < 1e-12)
  }

  test("planted complete block among degree-1 pairs is recovered exactly") {
    val blk = TestGraphs.block(0, 8, 100, 4)
    val es = blk ++ TestGraphs.pairs(500, 600, 40)
    val b = peel(es)
    assert(b.uIds.toSet == (1L to 8L).toSet)
    assert(b.vIds.toSet == (101L to 104L).toSet)
  }

  test("dense block beats a big hub star") {
    val es = TestGraphs.block(0, 10, 100, 5) ++ TestGraphs.star(999, 2000, 300)
    val b = peel(es)
    assert(b.uIds.toSet == (1L to 10L).toSet)
    assert(!b.vIds.contains(999L))
  }

  test("of two blocks with different density the denser is returned") {
    val dense = TestGraphs.block(0, 20, 100, 5)        // complete, 20x5
    val sparse = TestGraphs.block(1000, 10, 2000, 5, 2) // 2 edges per user
    val b = peel(dense ++ sparse)
    assert(b.uIds.toSet == (1L to 20L).toSet)
    assert(b.vIds.forall(v => v > 100 && v <= 105))
  }

  test("reported score is the recomputed phi of the returned node set") {
    val es = TestGraphs.block(0, 6, 100, 3) ++ TestGraphs.pairs(50, 200, 10)
    val b = peel(es)
    val w = TestGraphs.merchantWeightMap(es)
    val recomputed = TestGraphs.phiSubset(es, w, b.uIds.toSet, b.vIds.toSet)
    assert(math.abs(b.score - recomputed) < 1e-9)
  }

  test("block score is at least phi of the full graph") {
    val es = TestGraphs.block(0, 6, 100, 3) ++ TestGraphs.pairs(50, 200, 10)
    assert(peel(es).score >= DensityMetric.phi(LocalGraph.fromEdges(es)) - 1e-12)
  }

  test("deterministic across runs") {
    val es = TestGraphs.block(0, 5, 100, 4) ++ TestGraphs.pairs(50, 200, 7)
    val (a, b) = (peel(es), peel(es))
    assert(a.uIds.toSeq == b.uIds.toSeq && a.vIds.toSeq == b.vIds.toSeq && a.score == b.score)
  }

  test("returned ids come from the input graph") {
    val es = TestGraphs.block(0, 5, 100, 4)
    val b = peel(es)
    assert(b.uIds.toSet.subsetOf(es.map(_._1).toSet))
    assert(b.vIds.toSet.subsetOf(es.map(_._2).toSet))
  }

  // --- brute-force verification on tiny graphs -----------------------------

  private val tinyGen: Gen[Array[(Long, Long)]] =
    Gen.chooseNum(1, 14).flatMap { n =>
      Gen.listOfN(n,
        for { u <- Gen.choose(1L, 5L); v <- Gen.choose(100L, 104L) } yield (u, v)
      ).map(_.toArray)
    }

  checkProp("greedy peeling is within [OPT/2, OPT] of the brute-force optimum", 120) {
    Prop.forAll(tinyGen) { es =>
      val opt = TestGraphs.bruteForceOpt(es)
      val got = peel(es).score
      got <= opt + 1e-9 && got >= opt / 2.0 - 1e-9
    }
  }

  checkProp("block is non-empty and score non-negative") {
    Prop.forAll(tinyGen) { es =>
      val b = peel(es)
      b.nodeCount > 0 && b.score >= 0.0
    }
  }

  checkProp("score always equals recomputed phi of the block") {
    Prop.forAll(tinyGen) { es =>
      val b = peel(es)
      val w = TestGraphs.merchantWeightMap(es)
      math.abs(b.score - TestGraphs.phiSubset(es, w, b.uIds.toSet, b.vIds.toSet)) < 1e-9
    }
  }
}
