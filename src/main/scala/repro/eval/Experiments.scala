package repro.eval

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.baselines.{FBox, Fraudar, Spoken}
import repro.core.{EnsemFdet, EnsemParams, Fdet, SampleMethod, Sampling}
import repro.data.{FraudGraphGen, FraudSpec}
import repro.eval.Metrics.{PrPoint, Prf}

/** The paper's experiments (Section V), shared by `jobs/` entrypoints and the
  * `bench/` suites. Each function returns typed rows; `render*` turns them
  * into the text tables recorded in EXPERIMENTS.md.
  */
object Experiments {

  /** Default bench scale: 1/100 of the paper's Table I sizes (DESIGN.md §3). */
  val DefaultSf = 1.0

  // ---------------------------------------------------------------- Table I

  final case class DatasetStats(
      name: String, pins: Long, fraudPins: Long, merchants: Long, edges: Long)

  /** Table I analog: statistics of the generated datasets. PIN/merchant
    * counts are nodes that actually appear in the graph.
    */
  def tableI(spark: SparkSession, sf: Double = DefaultSf): Seq[DatasetStats] =
    FraudGraphGen.all.map { spec0 =>
      val spec = spec0.scaled(sf)
      val e = FraudGraphGen.edges(spark, spec).cache()
      val stats = DatasetStats(
        spec.name,
        pins = e.select("u").distinct().count(),
        fraudPins = FraudGraphGen.blacklist(spark, spec).count(),
        merchants = e.select("v").distinct().count(),
        edges = e.count())
      e.unpersist()
      stats
    }

  def renderTableI(rows: Seq[DatasetStats]): String =
    table(
      Seq("Dataset#", "Node:PIN", "Fraud PIN", "Node:Merchant", "Edge"),
      rows.map(r => Seq(r.name, r.pins.toString, r.fraudPins.toString,
        r.merchants.toString, r.edges.toString)))

  // -------------------------------------------------------------- Table III

  final case class TimingRow(
      name: String, ensemSec: Double, fraudarSec: Double) {
    def speedup: Double = if (ensemSec > 0) fraudarSec / ensemSec else 0.0
  }

  /** Table III analog: wall-clock of EnsemFDet (S=0.1, N=80, RES, truncated)
    * vs FRAUDAR (K fixed at 30, sequential) on the three datasets. Run at
    * sf=100 this is the paper's actual Table I scale (1M/2.8M/8M edges). A
    * cheap warm-up (a small-N ensemble, a 3-block FRAUDAR) precedes each
    * measurement so JIT/Spark job setup is not billed to either side; each
    * reported number is the median of `reps` runs.
    */
  def tableIII(
      spark: SparkSession,
      sf: Double = DefaultSf,
      n: Int = 80,
      s: Double = 0.1,
      kFraudar: Int = 30,
      reps: Int = 3): Seq[TimingRow] =
    FraudGraphGen.all.map { spec0 =>
      val spec = spec0.scaled(sf)
      val edges = FraudGraphGen.edges(spark, spec).cache()
      edges.count() // materialize: generation cost billed to neither method
      val p = EnsemParams(SampleMethod.RES, n = n, s = s, t = 1, seed = spec.seed)

      def ensemOnce(nRun: Int): Long =
        EnsemFdet.votes(spark, edges, p.copy(n = nRun)).count()
      ensemOnce(math.min(8, n)) // warm-up
      val ensemSec = Timer.medianSec(reps)(ensemOnce(n))

      val local = Fraudar.collectEdges(edges)
      Fraudar.run(local, 3) // warm-up (JIT)
      val fraudarSec = Timer.medianSec(reps)(Fraudar.run(local, kFraudar))

      edges.unpersist()
      TimingRow(spec.name, ensemSec, fraudarSec)
    }

  def renderTableIII(rows: Seq[TimingRow]): String =
    table(
      Seq("", "Dataset #1", "Dataset #2", "Dataset #3"),
      Seq(
        "EnsemFDet" +: rows.map(r => f"${r.ensemSec}%.3f sec"),
        "FRAUDAR" +: rows.map(r => f"${r.fraudarSec}%.3f sec"),
        "speedup" +: rows.map(r => f"${r.speedup}%.1fx")))

  // ------------------------------------------------- Figure 3/4: all methods

  final case class MethodRow(dataset: String, method: String, best: PrPoint)

  /** Best-F1 operating point of every comparison method on every dataset —
    * the scalar summary of the Figure 3/4 curves.
    */
  def methodComparison(
      spark: SparkSession,
      sf: Double = DefaultSf,
      n: Int = 80,
      s: Double = 0.1): Seq[MethodRow] =
    FraudGraphGen.all.flatMap { spec0 =>
      val spec = spec0.scaled(sf)
      val edges = FraudGraphGen.edges(spark, spec).cache()
      edges.count()
      val black = blacklistSet(spark, spec)
      val local = Fraudar.collectEdges(edges)

      val ensem = {
        val votes = EnsemFdet.votes(
          spark, edges, EnsemParams(SampleMethod.RES, n = n, s = s, seed = spec.seed))
        Metrics.voteSweep(Metrics.collectUserVotes(votes), black)
      }
      val fraudar = Fraudar
        .cumulativeUserSets(Fraudar.run(local, 30))
        .zipWithIndex
        .map { case (set, i) => PrPoint(i + 1.0, Metrics.prfLocal(set, black)) }
      val spoken = Metrics.scoreSweep(Spoken.userScores(local), black)
      val fbox = Metrics.scoreSweep(FBox.userScores(local), black)

      edges.unpersist()
      Seq(
        MethodRow(spec.name, "EnsemFDet", Metrics.bestF1(ensem)),
        MethodRow(spec.name, "FRAUDAR", Metrics.bestF1(fraudar)),
        MethodRow(spec.name, "SPOKEN", Metrics.bestF1(spoken)),
        MethodRow(spec.name, "FBOX", Metrics.bestF1(fbox)))
    }

  def renderMethodRows(rows: Seq[MethodRow]): String =
    table(
      Seq("Dataset", "Method", "best F1", "Precision", "Recall", "#detected"),
      rows.map(r => Seq(r.dataset, r.method, f"${r.best.prf.f1}%.3f",
        f"${r.best.prf.precision}%.3f", f"${r.best.prf.recall}%.3f",
        r.best.prf.detected.toString)))

  // ------------------------------------------------ Figure 5: sampling methods

  /** Best-F1 per sampling method on dataset #3 with S = 0.1, R = 8 (N = 80),
    * the Figure 5 setting.
    */
  def samplingComparison(
      spark: SparkSession,
      sf: Double = DefaultSf,
      n: Int = 80,
      s: Double = 0.1): Seq[MethodRow] = {
    val spec = FraudGraphGen.Jd3.scaled(sf)
    val edges = FraudGraphGen.edges(spark, spec).cache()
    edges.count()
    val black = blacklistSet(spark, spec)
    val rows = SampleMethod.all.map { m =>
      val votes = EnsemFdet.votes(
        spark, edges, EnsemParams(m, n = n, s = s, seed = spec.seed))
      val sweep = Metrics.voteSweep(Metrics.collectUserVotes(votes), black)
      MethodRow(spec.name, m.name, Metrics.bestF1(sweep))
    }
    edges.unpersist()
    rows
  }

  // --------------------------------------------- Figure 6: truncation vs FIX-K

  final case class TruncationRow(
      variant: String, best: PrPoint, blocksPerSample: Seq[Int])

  /** EnsemFDet (truncating point) vs EnsemFDet-FIX-K (k = 30) on dataset #3;
    * also reports per-sample detected-block counts for the truncated variant
    * (the paper records all of them < 15).
    */
  def truncationComparison(
      spark: SparkSession,
      sf: Double = DefaultSf,
      n: Int = 80,
      s: Double = 0.1,
      fixK: Int = 30): Seq[TruncationRow] = {
    val spec = FraudGraphGen.Jd3.scaled(sf)
    val edges = FraudGraphGen.edges(spark, spec).cache()
    edges.count()
    val black = blacklistSet(spark, spec)

    def sweep(truncate: Boolean) = {
      val votes = EnsemFdet.votes(spark, edges,
        EnsemParams(SampleMethod.RES, n = n, s = s, truncate = truncate,
          maxBlocks = fixK, seed = spec.seed))
      Metrics.voteSweep(Metrics.collectUserVotes(votes), black)
    }

    // k̂ of a handful of samples, recomputed driver-side for reporting.
    val kHats = (0 until 5).map { i =>
      val sample = Sampling.res(edges, 1, s, spec.seed + 100 + i)
      val es = sample.select("u", "v").collect().map(r => (r.getLong(0), r.getLong(1)))
      Fdet.run(es, maxBlocks = fixK).kHat
    }

    val rows = Seq(
      TruncationRow("EnsemFDet (truncated)", Metrics.bestF1(sweep(truncate = true)), kHats),
      TruncationRow(s"EnsemFDet-FIX-K (k=$fixK)", Metrics.bestF1(sweep(truncate = false)), Seq.empty))
    edges.unpersist()
    rows
  }

  def renderTruncationRows(rows: Seq[TruncationRow]): String =
    table(
      Seq("Variant", "best F1", "Precision", "Recall", "k̂ per sample"),
      rows.map(r => Seq(r.variant, f"${r.best.prf.f1}%.3f",
        f"${r.best.prf.precision}%.3f", f"${r.best.prf.recall}%.3f",
        if (r.blocksPerSample.isEmpty) "-" else r.blocksPerSample.mkString(","))))

  // ------------------------------------------------- Figures 7–9: N, S, T

  final case class SweepRow(setting: String, best: PrPoint)

  /** Figure 7: fix S = 0.1, vary N ∈ {10, 20, 40, 80} on dataset #3. */
  def sweepN(
      spark: SparkSession,
      sf: Double = DefaultSf,
      ns: Seq[Int] = Seq(10, 20, 40, 80)): Seq[SweepRow] =
    sweepOn(spark, sf, ns.map(n => (s"N=$n", EnsemParams(SampleMethod.RES, n = n, s = 0.1))))

  /** Figure 8: fix R = S × N = 1, vary S ∈ {0.01, 0.05, 0.1}. */
  def sweepS(
      spark: SparkSession,
      sf: Double = DefaultSf,
      ss: Seq[Double] = Seq(0.01, 0.05, 0.1)): Seq[SweepRow] =
    sweepOn(spark, sf, ss.map { s =>
      val n = math.max(1, math.round(1.0 / s).toInt)
      (f"S=$s%.2f,N=$n", EnsemParams(SampleMethod.RES, n = n, s = s))
    })

  private def sweepOn(
      spark: SparkSession, sf: Double, cases: Seq[(String, EnsemParams)]): Seq[SweepRow] = {
    val spec = FraudGraphGen.Jd3.scaled(sf)
    val edges = FraudGraphGen.edges(spark, spec).cache()
    edges.count()
    val black = blacklistSet(spark, spec)
    val rows = cases.map { case (label, p0) =>
      val votes = EnsemFdet.votes(spark, edges, p0.copy(seed = spec.seed))
      SweepRow(label, Metrics.bestF1(Metrics.voteSweep(Metrics.collectUserVotes(votes), black)))
    }
    edges.unpersist()
    rows
  }

  final case class TRow(t: Long, prf: Prf)

  /** Figure 9: the full T sweep at S = 0.1, N = 80 on dataset #3 — precision
    * rises and recall falls monotonically-in-shape with T.
    */
  def sweepT(
      spark: SparkSession,
      sf: Double = DefaultSf,
      n: Int = 80,
      s: Double = 0.1): Seq[TRow] = {
    val spec = FraudGraphGen.Jd3.scaled(sf)
    val edges = FraudGraphGen.edges(spark, spec).cache()
    edges.count()
    val black = blacklistSet(spark, spec)
    val votes = Metrics.collectUserVotes(EnsemFdet.votes(
      spark, edges, EnsemParams(SampleMethod.RES, n = n, s = s, seed = spec.seed)))
    edges.unpersist()
    Metrics.voteSweep(votes, black).map(p => TRow(p.threshold.toLong, p.prf))
  }

  def renderSweepRows(header: String, rows: Seq[SweepRow]): String =
    table(
      Seq(header, "best F1", "Precision", "Recall", "#detected"),
      rows.map(r => Seq(r.setting, f"${r.best.prf.f1}%.3f",
        f"${r.best.prf.precision}%.3f", f"${r.best.prf.recall}%.3f",
        r.best.prf.detected.toString)))

  def renderTRows(rows: Seq[TRow]): String =
    table(
      Seq("T", "#detected", "Precision", "Recall", "F1"),
      rows.map(r => Seq(r.t.toString, r.prf.detected.toString,
        f"${r.prf.precision}%.3f", f"${r.prf.recall}%.3f", f"${r.prf.f1}%.3f")))

  // ------------------------------------------------------------------ misc

  def blacklistSet(spark: SparkSession, spec: FraudSpec): Set[Long] =
    FraudGraphGen.blacklist(spark, spec).collect().map(_.getLong(0)).toSet

  /** Fixed-width text table (markdown-compatible). */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (fmt(header) +: sep +: rows.map(fmt)).mkString("\n")
  }
}
