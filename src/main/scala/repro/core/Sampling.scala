package repro.core

import java.util.SplittableRandom

import org.apache.spark.sql.DataFrame
import scala.util.hashing.byteswap64

/** The paper's bipartite sampling methods (Section IV-A). */
sealed trait SampleMethod { def name: String }

object SampleMethod {

  /** Random Edge Sampling — Bernoulli over edges (Section IV-A2). */
  case object RES extends SampleMethod { val name = "RES" }

  /** One-side Node Sampling on the user/PIN side (Section IV-A3);
    * "Node PIN Bagging" in Figure 5. */
  case object OnsPin extends SampleMethod { val name = "ONS-PIN" }

  /** One-side Node Sampling on the merchant side;
    * "Node Merchant Bagging" in Figure 5. */
  case object OnsMerchant extends SampleMethod { val name = "ONS-Merchant" }

  /** Two-sides Node Sampling (Section IV-A4). */
  case object TNS extends SampleMethod { val name = "TNS" }

  val all: Seq[SampleMethod] = Seq(RES, OnsPin, OnsMerchant, TNS)
}

/** DataFrame/Dataset implementations of the samplers. Each produces N sampled
  * subgraphs in a single pass as rows (sid, u, v) with sid ∈ [0, N);
  * downstream FDET groups by sid.
  *
  * All samplers are Bernoulli with ratio S, independent across sids. Rather
  * than tossing N coins per row (N·|E| work — explode-then-filter and even
  * interpreted array-filter both melt at N = 80 × millions of edges), each
  * row draws its *kept* sids directly with geometric skips: expected O(N·S)
  * work per row. The RNG is seeded from the row's ids, so sampling is
  * deterministic in (data, seed) and independent of partitioning.
  */
object Sampling {

  /** Sids in [0, n) kept by independent Bernoulli(s) draws, via geometric
    * inter-arrival skips.
    */
  private[core] def keptSids(seed: Long, n: Int, s: Double): Seq[Int] = {
    if (s <= 0.0) return Seq.empty
    if (s >= 1.0) return 0 until n
    val rng = new SplittableRandom(seed)
    val logKeepFail = math.log1p(-s) // ln(1 - s) < 0
    val out = Seq.newBuilder[Int]
    var i = -1
    var done = false
    while (!done) {
      // geometric skip >= 1: P(skip = k+1) = (1-s)^k * s
      val skip = 1 + math.floor(math.log1p(-rng.nextDouble()) / logKeepFail).toInt
      i += skip
      if (skip < 1 || i >= n) done = true else out += i
    }
    out.result()
  }

  /** Stable per-row seed from the row's key ids and the sampler seed. */
  private[core] def mixSeed(seed: Long, a: Long, b: Long): Long =
    byteswap64(seed) ^ byteswap64(a * 0x9E3779B97F4A7C15L) ^
      java.lang.Long.rotateLeft(byteswap64(b - 0x61C8864680B583EBL), 31)

  /** Random Edge Sampling: keep each (edge, sid) pair with probability s. */
  def res(edges: DataFrame, n: Int, s: Double, seed: Long): DataFrame = {
    val spark = edges.sparkSession
    import spark.implicits._
    edges.select("u", "v").as[(Long, Long)]
      .flatMap { case (u, v) => keptSids(mixSeed(seed, u, v), n, s).map(i => (i, u, v)) }
      .toDF("sid", "u", "v")
  }

  /** Per-sid sampled node sets for one column ("u" or "v"). */
  private def sampledNodes(
      edges: DataFrame, col: String, n: Int, s: Double, seed: Long): DataFrame = {
    val spark = edges.sparkSession
    import spark.implicits._
    edges.select(col).distinct().as[Long]
      .flatMap(id => keptSids(mixSeed(seed, id, if (col == "u") 1L else 2L), n, s).map(i => (i, id)))
      .toDF("sid", col)
  }

  /** One-side node sampling on the user side: sample user sets per sid, then
    * take all edges incident to sampled users (all merchant columns kept —
    * "sampling rows of W", Section IV-A3).
    */
  def onsPin(edges: DataFrame, n: Int, s: Double, seed: Long): DataFrame =
    edges.join(sampledNodes(edges, "u", n, s, seed), "u").select("sid", "u", "v")

  /** One-side node sampling on the merchant side ("sampling columns of W"). */
  def onsMerchant(edges: DataFrame, n: Int, s: Double, seed: Long): DataFrame =
    edges.join(sampledNodes(edges, "v", n, s, seed), "v").select("sid", "u", "v")

  /** Two-sides node sampling: sample rows AND columns of W; the subgraph is
    * the cross-section (≈ S² of the original at ratio S, Section IV-A4).
    */
  def tns(edges: DataFrame, n: Int, s: Double, seed: Long): DataFrame =
    edges
      .join(sampledNodes(edges, "u", n, s, seed), "u")
      .join(sampledNodes(edges, "v", n, s, seed + 1), Seq("v", "sid"))
      .select("sid", "u", "v")

  /** Dispatch on the method enum. */
  def apply(method: SampleMethod, edges: DataFrame, n: Int, s: Double, seed: Long): DataFrame =
    method match {
      case SampleMethod.RES         => res(edges, n, s, seed)
      case SampleMethod.OnsPin      => onsPin(edges, n, s, seed)
      case SampleMethod.OnsMerchant => onsMerchant(edges, n, s, seed)
      case SampleMethod.TNS         => tns(edges, n, s, seed)
    }
}
