package repro.baselines

/** FBOX baseline [31] (Shah et al.).
  *
  * FBOX takes the adversarial view: attacks small enough to evade the top-k
  * SVD components live almost entirely in the *residual*. A user whose row
  * a_u has non-trivial degree but a small projection onto the top-k right
  * singular subspace is "below the spectral radar" and flagged.
  *
  * Row u of A = UΣVᵀ projected onto span(v_1..v_k) has squared norm
  * Σ_k (σ_k · U_k[u])², and ‖a_u‖² = degree(u) for a 0/1 adjacency. The
  * suspiciousness score is 1 − ‖proj a_u‖ / ‖a_u‖ for users with degree ≥
  * minDegree (degree-1 users carry no signal), ranked descending.
  */
object FBox {

  val DefaultComponents = 25
  val DefaultMinDegree = 2

  /** Per-user suspiciousness score in [0, 1], higher = more suspicious. */
  def userScores(
      edges: Array[(Long, Long)],
      k: Int = DefaultComponents,
      minDegree: Int = DefaultMinDegree,
      seed: Long = 7L): Seq[(Long, Double)] = {
    require(edges.nonEmpty, "empty graph")
    val (uIds, _, idx) = SparseSvd.indexEdges(edges)
    val nV = idx.map(_._2).max + 1
    val svd = SparseSvd.compute(uIds.length, nV, idx, k, seed = seed)
    val deg = new Array[Int](uIds.length)
    idx.foreach { case (i, _) => deg(i) += 1 }
    uIds.indices.map { i =>
      if (deg(i) < minDegree) (uIds(i), 0.0)
      else {
        var projSq = 0.0
        var c = 0
        while (c < svd.rank) {
          val t = svd.s(c) * svd.u(c)(i)
          projSq += t * t
          c += 1
        }
        val ratio = math.min(1.0, math.sqrt(projSq / deg(i)))
        (uIds(i), 1.0 - ratio)
      }
    }
  }
}
