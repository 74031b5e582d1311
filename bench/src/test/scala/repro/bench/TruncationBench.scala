package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Figure 6 shaped comparison: EnsemFDet with the truncating point
  * (Definition 3) vs EnsemFDet-FIX-K (k = 30) on dataset #3.
  *
  * Paper's claims to reproduce: the truncated variant matches or beats FIX-K
  * (FIX-K's extra blocks add near-random-precision nodes), and every
  * per-sample detected-block count stays below 15.
  */
class TruncationBench extends SparkSpec {

  private lazy val rows = Experiments.truncationComparison(spark, sf = 1.0, n = 80, s = 0.1, fixK = 30)

  test("Figure 6: compute and report truncation vs FIX-K") {
    println("\n=== Truncating point vs FIX-K on jd3 (ours, sf=1, S=0.1, N=80) ===")
    println(Experiments.renderTruncationRows(rows))
    assert(rows.size == 2)
  }

  test("Figure 6: truncated EnsemFDet is at least as good as FIX-K") {
    val trunc = rows.head.best.prf.f1
    val fixK = rows.last.best.prf.f1
    assert(trunc >= fixK - 0.02, s"truncated=$trunc fixK=$fixK")
  }

  test("Figure 6: per-sample block counts stay below 15 (paper's record)") {
    assert(rows.head.blocksPerSample.nonEmpty)
    rows.head.blocksPerSample.foreach(k => assert(k < 15, s"kHat=$k"))
  }
}
