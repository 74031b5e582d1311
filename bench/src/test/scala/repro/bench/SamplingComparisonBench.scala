package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Figure 5 shaped comparison: the four sampling methods inside EnsemFDet on
  * dataset #3 with S = 0.1, R = 8 (N = 80).
  *
  * Paper's claims: RES is top-tier; ONS-PIN is worst on their data (fraud
  * PINs there have degree ~1, so PIN-side sampling destroys ring topology);
  * merchant bagging can blow samples up to ~30% of the graph via hubs.
  *
  * On our synthetic substitute fraud PINs have degree 5–6 (they must, for
  * rings to out-score the background core at 1/100 scale), so ONS-PIN
  * retains topology and lands second instead of last — the ordering of the
  * two ONS variants is the one Figure 5 claim that does not transfer; see
  * EXPERIMENTS.md. What does transfer: RES best, vote-threshold control, and
  * the hub-blow-up size effect.
  */
class SamplingComparisonBench extends SparkSpec {

  private lazy val rows = Experiments.samplingComparison(spark, sf = 1.0, n = 80, s = 0.1)

  test("Figure 5: compute and report the four samplers on dataset #3") {
    println("\n=== Sampling methods on jd3, best F1 (ours, sf=1, S=0.1, N=80) ===")
    println(Experiments.renderMethodRows(rows))
    assert(rows.map(_.method) == Seq("RES", "ONS-PIN", "ONS-Merchant", "TNS"))
  }

  test("Figure 5: RES is the best (or tied-best) sampler") {
    val by = rows.map(r => r.method -> r.best.prf.f1).toMap
    assert(by.values.forall(_ <= by("RES") + 0.02), s"$by")
  }

  test("Figure 5: every sampler detects real signal") {
    rows.foreach(r => assert(r.best.prf.f1 > 0.25, s"${r.method}: ${r.best.prf.f1}"))
  }

  test("Figure 5: one-side node sampling keeps whole stars (paper's size remark)") {
    // The paper notes merchant bagging can blow a sample up to ~30% of the
    // graph when a hub is sampled; our Zipf head reproduces that: check the
    // largest ONS-Merchant sample is far above the S=0.1 average.
    import repro.core.{SampleMethod, Sampling}
    import repro.data.FraudGraphGen
    val spec = FraudGraphGen.Jd3.scaled(1.0)
    val edges = FraudGraphGen.edges(spark, spec).cache()
    val total = edges.count().toDouble
    val perSid = Sampling(SampleMethod.OnsMerchant, edges, 20, 0.1, spec.seed)
      .groupBy("sid").count().collect().map(_.getLong(1).toDouble)
    edges.unpersist()
    assert(perSid.max / total > 0.15, s"max sample=${perSid.max / total} of graph")
  }
}
