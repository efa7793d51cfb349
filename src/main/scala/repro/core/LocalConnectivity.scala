package repro.core

import repro.graph.{AdjGraph, GraphOps}

/** LOC-CUT (Algorithm 2, lines 12–17) and exact vertex connectivity.
  *
  * `locCut(fn, g, u, v, k)` tests whether u and v can be separated by fewer
  * than k vertices in `g` and, if so, returns one minimum u–v vertex cut.
  */
object LocalConnectivity {

  /** Returns Some(cut) with |cut| < k if κ(u,v) < k, else None.
    * Adjacent (or identical) vertices are never separable (Lemma 5).
    * `fn` must be the flow network of `g`.
    */
  def locCut(fn: FlowNetwork, g: AdjGraph, u: Int, v: Int, k: Int): Option[Array[Int]] = {
    if (u == v || g.hasEdge(u, v)) return None
    fn.reset()
    val lambda = fn.maxFlowUpTo(u, v, k)
    if (lambda >= k) None
    else Some(fn.minCutVertices(u))
  }

  /** κ(u,v) capped at `cap` (+∞ collapses to `cap` for adjacent pairs). */
  def connectivityUpTo(fn: FlowNetwork, g: AdjGraph, u: Int, v: Int, cap: Int): Int = {
    if (u == v || g.hasEdge(u, v)) cap
    else {
      fn.reset()
      fn.maxFlowUpTo(u, v, cap)
    }
  }
}

/** Exact global vertex connectivity κ(G) — used by tests and the
  * effectiveness metrics, not by the enumeration hot path.
  *
  * Two-phase scheme (Even / Esfahanian–Hakimi, the same structure as
  * GLOBAL-CUT): pick a min-degree vertex u; any minimum cut either avoids u
  * (then it separates u from some non-neighbor — phase 1 finds it) or
  * contains u (then it separates two neighbors of u — phase 2 finds it,
  * Lemma 4).
  */
object VertexConnectivity {

  /** κ(G): 0 if disconnected or trivial, n−1 for the complete graph. */
  def kappa(g: AdjGraph): Int = {
    val n = g.n
    if (n <= 1) return 0
    if (!GraphOps.isConnected(g)) return 0
    if (g.m.toLong == n.toLong * (n - 1) / 2) return n - 1
    val fn = new FlowNetwork(g)
    val u = g.minDegreeVertex
    var best = n - 1
    // Phase 1: u versus every non-neighbor.
    var v = 0
    while (v < n) {
      if (v != u && !g.hasEdge(u, v)) {
        val c = LocalConnectivity.connectivityUpTo(fn, g, u, v, best)
        if (c < best) best = c
      }
      v += 1
    }
    // Phase 2: all non-adjacent pairs of neighbors of u.
    val nb = g.neighbors(u)
    var i = 0
    while (i < nb.length) {
      var j = i + 1
      while (j < nb.length) {
        if (!g.hasEdge(nb(i), nb(j))) {
          val c = LocalConnectivity.connectivityUpTo(fn, g, nb(i), nb(j), best)
          if (c < best) best = c
        }
        j += 1
      }
      i += 1
    }
    best
  }

  /** Definition 2: k-vertex connected ⇔ |V| > k and κ(G) ≥ k. */
  def isKConnected(g: AdjGraph, k: Int): Boolean = g.n > k && kappa(g) >= k
}
