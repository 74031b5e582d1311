package repro.core

/** Greedy Charikar-style peeling (Algorithm 1 lines 3–8): repeatedly remove
  * the minimum-priority node and return the intermediate graph H_i with the
  * highest density score φ.
  *
  * A node's priority is its marginal contribution to the weighted edge mass
  * f(S) = Σ_{(i,j)∈E(S)} w_j: for a user it is Σ_{j∈N(u)} w_j over still-live
  * merchants, for a merchant j it is d_S(j)·w_j. Priorities only decrease, so
  * an index-addressed binary min-heap with decrease-key gives the paper's
  * O(|E| log(|U|+|V|)) bound with no boxing on the hot path.
  */
object Peeling {

  /** One detected dense block: the surviving node ids and its φ score. */
  final case class Block(uIds: Array[Long], vIds: Array[Long], score: Double) {
    def nodeCount: Int = uIds.length + vIds.length
  }

  /** Array-backed binary min-heap over node indices with decrease-key. */
  private[core] final class IndexMinHeap(n: Int) {
    private val heap = new Array[Int](n)
    private val pos = new Array[Int](n)
    private val key = new Array[Double](n)
    private var sz = 0

    def size: Int = sz

    def insert(node: Int, k: Double): Unit = {
      key(node) = k
      heap(sz) = node
      pos(node) = sz
      sz += 1
      siftUp(sz - 1)
    }

    /** Lower `node`'s key to `k` (must not increase it). */
    def decrease(node: Int, k: Double): Unit = {
      key(node) = k
      siftUp(pos(node))
    }

    /** Remove and return the minimum-key node. */
    def deleteMin(): Int = {
      val m = heap(0)
      sz -= 1
      if (sz > 0) {
        heap(0) = heap(sz)
        pos(heap(0)) = 0
        siftDown(0)
      }
      pos(m) = -1
      m
    }

    private def siftUp(i0: Int): Unit = {
      var i = i0
      val node = heap(i)
      val k = key(node)
      while (i > 0 && key(heap((i - 1) >> 1)) > k) {
        val p = (i - 1) >> 1
        heap(i) = heap(p); pos(heap(i)) = i
        i = p
      }
      heap(i) = node; pos(node) = i
    }

    private def siftDown(i0: Int): Unit = {
      var i = i0
      val node = heap(i)
      val k = key(node)
      var done = false
      while (!done) {
        var c = 2 * i + 1
        if (c >= sz) done = true
        else {
          if (c + 1 < sz && key(heap(c + 1)) < key(heap(c))) c += 1
          if (key(heap(c)) >= k) done = true
          else {
            heap(i) = heap(c); pos(heap(i)) = i
            i = c
          }
        }
      }
      heap(i) = node; pos(node) = i
    }
  }

  /** Peel `g` under fixed merchant weights and return the densest prefix. */
  def densestBlock(g: LocalGraph, weights: Array[Double]): Block = {
    val nU = g.numU; val nV = g.numV; val n = nU + nV
    require(n > 0, "empty graph")

    // node code: user i -> i, merchant j -> nU + j
    val prio = new Array[Double](n)
    var f = 0.0
    var j = 0
    while (j < nV) {
      val w = g.vAdj(j).length * weights(j)
      prio(nU + j) = w; f += w; j += 1
    }
    var i = 0
    while (i < nU) {
      var s = 0.0
      val adj = g.uAdj(i)
      var a = 0
      while (a < adj.length) { s += weights(adj(a)); a += 1 }
      prio(i) = s; i += 1
    }

    val removed = new Array[Boolean](n)
    val heap = new IndexMinHeap(n)
    var k = 0
    while (k < n) { heap.insert(k, prio(k)); k += 1 }

    val order = new Array[Int](n) // removal order
    var remaining = n
    var best = f / n
    var bestRemaining = n
    var t = 0
    while (remaining > 1) {
      val node = heap.deleteMin()
      removed(node) = true
      f -= prio(node)
      if (node < nU) {
        val adj = g.uAdj(node)
        var a = 0
        while (a < adj.length) {
          val vj = adj(a)
          if (!removed(nU + vj)) {
            prio(nU + vj) -= weights(vj)
            heap.decrease(nU + vj, prio(nU + vj))
          }
          a += 1
        }
      } else {
        val vj = node - nU
        val wj = weights(vj)
        val adj = g.vAdj(vj)
        var a = 0
        while (a < adj.length) {
          val ui = adj(a)
          if (!removed(ui)) {
            prio(ui) -= wj
            heap.decrease(ui, prio(ui))
          }
          a += 1
        }
      }
      order(t) = node; t += 1; remaining -= 1
      val cur = f / remaining
      if (cur > best + 1e-15) { best = cur; bestRemaining = remaining }
    }

    // Reconstruct the best state: everything except the first (n - bestRemaining)
    // removals survives.
    val cut = n - bestRemaining
    val kept = Array.fill(n)(true)
    var r = 0
    while (r < cut) { kept(order(r)) = false; r += 1 }
    val us = Array.newBuilder[Long]
    i = 0
    while (i < nU) { if (kept(i)) us += g.uIds(i); i += 1 }
    val vs = Array.newBuilder[Long]
    j = 0
    while (j < nV) { if (kept(nU + j)) vs += g.vIds(j); j += 1 }
    Block(us.result(), vs.result(), best)
  }
}
