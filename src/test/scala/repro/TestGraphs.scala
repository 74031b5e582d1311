package repro

import repro.core.DensityMetric

/** Hand-buildable bipartite graphs and a brute-force densest-subgraph oracle
  * for verifying the peeling kernel on tiny instances.
  */
object TestGraphs {

  /** A fraud-ring-like block: `nU` users each buying from `epu` distinct
    * merchants of a pool of `nV` (complete biclique when epu = nV).
    * Ids are 1-based offsets from the given bases.
    */
  def block(uBase: Long, nU: Int, vBase: Long, nV: Int, epu: Int = -1): Array[(Long, Long)] = {
    val e = if (epu < 0) nV else epu
    require(e <= nV)
    (for { i <- 0 until nU; j <- 0 until e }
      yield (uBase + i + 1, vBase + (i * 3 + j) % nV + 1)).toArray
  }

  /** Degree-1 background: n disjoint (user, merchant) pairs. */
  def pairs(uBase: Long, vBase: Long, n: Int): Array[(Long, Long)] =
    (0 until n).map(i => (uBase + i + 1, vBase + i + 1)).toArray

  /** A single merchant hub with n distinct customers. */
  def star(vId: Long, uBase: Long, n: Int): Array[(Long, Long)] =
    (0 until n).map(i => (uBase + i + 1, vId)).toArray

  /** Global per-merchant weights 1/log(d_j + c) of an edge list. */
  def merchantWeightMap(edges: Array[(Long, Long)], c: Double = DensityMetric.DefaultC): Map[Long, Double] =
    edges.distinct.groupBy(_._2).map { case (v, es) => v -> 1.0 / math.log(es.length + c) }

  /** φ of the induced subgraph on (us, vs) under fixed global weights. */
  def phiSubset(
      edges: Array[(Long, Long)],
      weights: Map[Long, Double],
      us: Set[Long],
      vs: Set[Long]): Double = {
    val n = us.size + vs.size
    if (n == 0) 0.0
    else edges.distinct.iterator
      .filter { case (u, v) => us(u) && vs(v) }
      .map { case (_, v) => weights(v) }
      .sum / n
  }

  /** Exhaustive max of φ over every non-empty node subset — O(2^(|U|+|V|)),
    * only for graphs with ≤ ~10 nodes total.
    */
  def bruteForceOpt(edges: Array[(Long, Long)]): Double = {
    val distinct = edges.distinct
    val us = distinct.map(_._1).distinct
    val vs = distinct.map(_._2).distinct
    require(us.length <= 6 && vs.length <= 6, "brute force is exponential")
    val w = merchantWeightMap(distinct)
    val best = for {
      um <- 0 until (1 << us.length)
      vm <- 0 until (1 << vs.length)
      if um + vm > 0
    } yield phiSubset(
      distinct, w,
      us.indices.filter(i => (um & (1 << i)) != 0).map(us).toSet,
      vs.indices.filter(j => (vm & (1 << j)) != 0).map(vs).toSet)
    best.max
  }
}
