package repro.core

import repro.graph.{AdjGraph, GraphOps}

/** Exponential-time ground-truth oracles for tiny graphs (tests only). */
object BruteForce {

  /** κ(G) by trying every vertex subset in increasing size — Definition 1.
    * Only for n ≤ ~13.
    */
  def kappaNaive(g: AdjGraph): Int = {
    val n = g.n
    if (n <= 1) return 0
    if (!GraphOps.isConnected(g)) return 0
    var size = 1
    while (size <= n - 2) {
      if (subsetsOfSize(n, size).exists(s => !GraphOps.isConnected(g.induced(complement(n, s)))))
        return size
      size += 1
    }
    n - 1 // complete graph (or removal can only leave a trivial graph)
  }

  /** κ(u,v): minimum u-v vertex cut size; -1 encodes +∞ (adjacent pair). */
  def localConnectivityNaive(g: AdjGraph, u: Int, v: Int): Int = {
    if (u == v || g.hasEdge(u, v)) return -1
    val n = g.n
    var size = 0
    while (size <= n - 2) {
      val found = subsetsOfSize(n, size).exists { s =>
        !s.contains(u) && !s.contains(v) && {
          val rest = complement(n, s)
          val sub = g.induced(rest)
          val ui = rest.indexOf(u); val vi = rest.indexOf(v)
          GraphOps.bfsDistances(sub, ui)(vi) == -1
        }
      }
      if (found) return size
      size += 1
    }
    n - 2
  }

  /** All k-VCCs by maximality over every vertex subset — only for n ≤ ~13.
    * Returns canonical sorted-id vertex sets.
    */
  def kvccNaive(g: AdjGraph, k: Int): Set[Set[Long]] = {
    val n = g.n
    val connectedK = scala.collection.mutable.ArrayBuffer.empty[Set[Int]]
    // |V| > k (Definition 2) ⇒ candidate subsets have ≥ k+1 vertices.
    var mask = 0
    val limit = 1 << n
    while (mask < limit) {
      val verts = (0 until n).filter(i => (mask & (1 << i)) != 0)
      if (verts.length >= k + 1) {
        val sub = g.induced(verts.toArray)
        if (GraphOps.isConnected(sub) && kappaNaive(sub) >= k) connectedK += verts.toSet
      }
      mask += 1
    }
    val maximal = connectedK.filter(s => !connectedK.exists(t => t != s && s.subsetOf(t)))
    maximal.map(_.map(g.ids(_)): Set[Long]).toSet
  }

  private def complement(n: Int, s: Set[Int]): Array[Int] =
    (0 until n).filter(!s.contains(_)).toArray

  private def subsetsOfSize(n: Int, size: Int): Iterator[Set[Int]] =
    (0 until n).combinations(size).map(_.toSet)
}
