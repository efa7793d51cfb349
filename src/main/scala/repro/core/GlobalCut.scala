package repro.core

import repro.graph.AdjGraph

/** Basic GLOBAL-CUT (Algorithm 2): find a vertex cut of size < k, or prove
  * the graph k-connected.
  *
  * Phase 1 tests the source u against every other vertex (covers every cut
  * avoiding u); phase 2 tests every pair of neighbors of u (covers cuts
  * containing u, Lemma 4). All testing happens on the sparse certificate;
  * because the certificate is strong, a returned cut is a cut of the input
  * graph too.
  */
object GlobalCut {

  /** Returns Some(cut local indices) with |cut| < k, or None if k-connected.
    * `stats`, when provided, tallies LOC-CUT invocations (flow tests).
    */
  def find(g: AdjGraph, k: Int, stats: KvccStats = KvccStats.noop): Option[Array[Int]] = {
    val cert = SparseCertificate.compute(g, k).graph
    val fn = new FlowNetwork(cert)
    val u = cert.minDegreeVertex
    val n = cert.n
    // Phase 1: u against all other vertices.
    var v = 0
    while (v < n) {
      if (v != u) {
        if (!(v == u || cert.hasEdge(u, v))) stats.flowTests += 1
        stats.phase1Processed += 1
        stats.phase1Tested += 1
        val cut = LocalConnectivity.locCut(fn, cert, u, v, k)
        if (cut.isDefined) return cut
      }
      v += 1
    }
    // Phase 2: pairs of neighbors of u.
    val nb = cert.neighbors(u)
    var i = 0
    while (i < nb.length) {
      var j = i + 1
      while (j < nb.length) {
        if (!cert.hasEdge(nb(i), nb(j))) stats.flowTests += 1
        val cut = LocalConnectivity.locCut(fn, cert, nb(i), nb(j), k)
        if (cut.isDefined) return cut
        j += 1
      }
      i += 1
    }
    None
  }
}
