package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Figure 3/4 shaped comparison: best-F1 operating point of EnsemFDet,
  * FRAUDAR, SPOKEN and FBOX on all three datasets.
  *
  * Paper's qualitative claims to reproduce:
  *  - EnsemFDet and FRAUDAR clearly beat the SVD methods on every dataset;
  *  - EnsemFDet ≈ FRAUDAR in F1 while giving a smooth (vote-controlled)
  *    operating curve instead of FRAUDAR's discrete block jumps;
  *  - the SVD methods are unstable across datasets.
  */
class MethodComparisonBench extends SparkSpec {

  private lazy val rows = Experiments.methodComparison(spark, sf = 1.0, n = 80, s = 0.1)

  test("Figure 3/4: compute and report all methods on all datasets") {
    println("\n=== Method comparison, best F1 (ours, sf=1, S=0.1, N=80) ===")
    println(Experiments.renderMethodRows(rows))
    assert(rows.size == 12)
  }

  for (d <- Seq("jd1", "jd2", "jd3")) {
    test(s"Figure 3: EnsemFDet reaches high F1 on $d") {
      val f1 = rows.find(r => r.dataset == d && r.method == "EnsemFDet").get.best.prf.f1
      assert(f1 > 0.5, s"EnsemFDet F1 on $d = $f1")
    }

    test(s"Figure 3: FRAUDAR reaches high F1 on $d") {
      val f1 = rows.find(r => r.dataset == d && r.method == "FRAUDAR").get.best.prf.f1
      assert(f1 > 0.5, s"FRAUDAR F1 on $d = $f1")
    }

    test(s"Figure 3: graph methods beat the SVD methods on $d") {
      val by = rows.filter(_.dataset == d).map(r => r.method -> r.best.prf.f1).toMap
      val graphMin = math.min(by("EnsemFDet"), by("FRAUDAR"))
      val svdMax = math.max(by("SPOKEN"), by("FBOX"))
      assert(graphMin > svdMax, s"graph=$graphMin svd=$svdMax")
    }
  }

  test("Figure 4: EnsemFDet is within striking distance of FRAUDAR everywhere") {
    Seq("jd1", "jd2", "jd3").foreach { d =>
      val by = rows.filter(_.dataset == d).map(r => r.method -> r.best.prf.f1).toMap
      assert(by("EnsemFDet") > 0.8 * by("FRAUDAR"),
        s"$d: EnsemFDet ${by("EnsemFDet")} vs FRAUDAR ${by("FRAUDAR")}")
    }
  }
}
