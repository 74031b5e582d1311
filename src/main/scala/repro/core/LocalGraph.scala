package repro.core

import scala.collection.mutable

/** Compact in-memory bipartite graph for the sequential FDET kernel.
  *
  * One instance is built per sampled subgraph inside a single executor task
  * (EnsemFDet runs FDET on every sampled subgraph in parallel), or on the
  * driver for the sequential FRAUDAR baseline. Node ids are remapped to dense
  * int indices; adjacency is stored as int arrays (CSR-like, one array per
  * node) so peeling is allocation-free. Construction avoids boxed tuple
  * hashing: duplicate edges are collapsed by sorting each user's adjacency.
  *
  * @param uIds original user (PIN) ids, sorted; index i in [0, numU)
  * @param vIds original merchant ids, sorted; index j in [0, numV)
  * @param uAdj for each user index, the merchant indices it buys from (sorted)
  * @param vAdj for each merchant index, the user indices buying from it
  */
final class LocalGraph private[core] (
    val uIds: Array[Long],
    val vIds: Array[Long],
    val uAdj: Array[Array[Int]],
    val vAdj: Array[Array[Int]]) {

  /** Number of user-side nodes. */
  def numU: Int = uIds.length

  /** Number of merchant-side nodes. */
  def numV: Int = vIds.length

  /** |U| + |V|, the denominator of the density score. */
  def numNodes: Int = numU + numV

  /** Number of (distinct) edges. */
  def numEdges: Long = {
    var s = 0L; var i = 0
    while (i < uAdj.length) { s += uAdj(i).length; i += 1 }
    s
  }

  /** Merchant degrees d_j, aligned with `vIds`. */
  def vDegrees: Array[Int] = vAdj.map(_.length)

  /** User degrees, aligned with `uIds`. */
  def uDegrees: Array[Int] = uAdj.map(_.length)
}

object LocalGraph {

  /** Build from an edge list; duplicate (u, v) pairs are collapsed — the
    * 'who buy-from where' graph is simple (repeat purchases are one edge).
    */
  def fromEdges(edges: Array[(Long, Long)]): LocalGraph = {
    val uIds = sortedDistinctIds(edges, first = true)
    val vIds = sortedDistinctIds(edges, first = false)
    val uIdx = indexOf(uIds)
    val vIdx = indexOf(vIds)

    // Bucket merchant indices per user (duplicates included), then sort and
    // collapse each bucket.
    val uCnt = new Array[Int](uIds.length)
    var e = 0
    while (e < edges.length) { uCnt(uIdx(edges(e)._1)) += 1; e += 1 }
    val buckets = new Array[Array[Int]](uIds.length)
    var u = 0
    while (u < uIds.length) { buckets(u) = new Array[Int](uCnt(u)); u += 1 }
    val fill = new Array[Int](uIds.length)
    e = 0
    while (e < edges.length) {
      val ui = uIdx(edges(e)._1)
      buckets(ui)(fill(ui)) = vIdx(edges(e)._2)
      fill(ui) += 1
      e += 1
    }

    val vCnt = new Array[Int](vIds.length)
    val uAdj = new Array[Array[Int]](uIds.length)
    u = 0
    while (u < uIds.length) {
      val a = buckets(u)
      java.util.Arrays.sort(a)
      var m = 0
      var k = 0
      while (k < a.length) {
        if (k == 0 || a(k) != a(k - 1)) { a(m) = a(k); m += 1 }
        k += 1
      }
      val out = java.util.Arrays.copyOf(a, m)
      uAdj(u) = out
      k = 0
      while (k < m) { vCnt(out(k)) += 1; k += 1 }
      u += 1
    }

    val vAdj = new Array[Array[Int]](vIds.length)
    var v = 0
    while (v < vIds.length) { vAdj(v) = new Array[Int](vCnt(v)); v += 1 }
    val vFill = new Array[Int](vIds.length)
    u = 0
    while (u < uIds.length) {
      val a = uAdj(u)
      var k = 0
      while (k < a.length) {
        val vj = a(k)
        vAdj(vj)(vFill(vj)) = u
        vFill(vj) += 1
        k += 1
      }
      u += 1
    }
    new LocalGraph(uIds, vIds, uAdj, vAdj)
  }

  private def sortedDistinctIds(edges: Array[(Long, Long)], first: Boolean): Array[Long] = {
    val seen = new mutable.LongMap[Unit](edges.length * 2)
    var i = 0
    while (i < edges.length) {
      seen.update(if (first) edges(i)._1 else edges(i)._2, ())
      i += 1
    }
    val out = seen.keysIterator.toArray
    java.util.Arrays.sort(out)
    out
  }

  private def indexOf(ids: Array[Long]): mutable.LongMap[Int] = {
    val m = new mutable.LongMap[Int](ids.length * 2)
    var i = 0
    while (i < ids.length) { m.update(ids(i), i); i += 1 }
    m
  }
}
