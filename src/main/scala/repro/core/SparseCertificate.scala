package repro.core

import repro.graph.AdjGraph
import scala.collection.mutable

/** Sparse certificate of k-vertex connectivity (Section 4.2, Theorem 5).
  *
  * Runs scan-first search (we use BFS, a special case as the paper notes)
  * k times; pass i extracts a spanning forest `F_i` of the edges not taken
  * by earlier passes. `F_1 ∪ … ∪ F_k` is a *strong* certificate
  * (Cheriyan–Kao–Thurimella): for any vertex set S with |S| < k, the
  * certificate minus S has the same connected components as G minus S — so a
  * small vertex cut found on the certificate is a cut of G.
  *
  * Side-groups (Section 5.2, Theorem 10): the connected components of the
  * last forest `F_k`. Any two vertices in the same component of `F_k` are
  * local-k-connected, so each component is a side-group; only groups with
  * more than k vertices are useful for sweeping and are returned.
  */
object SparseCertificate {

  /** `graph` shares the local index space (and `ids`) of the input graph;
    * `sideGroups` holds local-index groups (components of F_k, size > k).
    */
  final case class Cert(graph: AdjGraph, sideGroups: Vector[Array[Int]])

  def compute(g: AdjGraph, k: Int): Cert = {
    require(k >= 1, s"k must be >= 1, got $k")
    val n = g.n
    if (n == 0) return Cert(g, Vector.empty)

    // Edge-id view of the graph: edge e = (edgeU(e), edgeV(e)).
    val m = g.m
    val edgeU = new Array[Int](m)
    val edgeV = new Array[Int](m)
    // Incident edge ids per vertex, CSR.
    val incOffsets = new Array[Int](n + 1)
    var v = 0
    while (v < n) { incOffsets(v + 1) = incOffsets(v) + g.degree(v); v += 1 }
    val incEdge = new Array[Int](incOffsets(n))
    val cursor = incOffsets.clone()
    var eid = 0
    v = 0
    while (v < n) {
      g.foreachNeighbor(v) { w =>
        if (v < w) {
          edgeU(eid) = v; edgeV(eid) = w
          incEdge(cursor(v)) = eid; cursor(v) += 1
          incEdge(cursor(w)) = eid; cursor(w) += 1
          eid += 1
        }
      }
      v += 1
    }

    val inCert = new Array[Boolean](m) // edge assigned to some forest F_i
    val visited = new Array[Int](n)    // pass stamp, 0 = never
    val queue = new Array[Int](n)
    var lastForestComp: Array[Int] = null

    var pass = 1
    while (pass <= k) {
      java.util.Arrays.fill(visited, 0)
      val comp = if (pass == k) new Array[Int](n) else null
      var root = 0
      var compId = 0
      while (root < n) {
        if (visited(root) == 0) {
          visited(root) = pass
          if (comp != null) comp(root) = compId
          var qh = 0; var qt = 0
          queue(qt) = root; qt += 1
          while (qh < qt) {
            val x = queue(qh); qh += 1
            var i = incOffsets(x)
            val end = incOffsets(x + 1)
            while (i < end) {
              val e = incEdge(i)
              if (!inCert(e)) {
                val y = if (edgeU(e) == x) edgeV(e) else edgeU(e)
                if (visited(y) == 0) {
                  visited(y) = pass
                  inCert(e) = true // tree edge of F_pass — removed from G_pass
                  if (comp != null) comp(y) = compId
                  queue(qt) = y; qt += 1
                }
              }
              i += 1
            }
          }
          compId += 1
        }
        root += 1
      }
      if (comp != null) lastForestComp = comp
      pass += 1
    }

    // Certificate adjacency from the union of forests.
    val certDeg = new Array[Int](n)
    eid = 0
    while (eid < m) {
      if (inCert(eid)) { certDeg(edgeU(eid)) += 1; certDeg(edgeV(eid)) += 1 }
      eid += 1
    }
    val certOffsets = new Array[Int](n + 1)
    v = 0
    while (v < n) { certOffsets(v + 1) = certOffsets(v) + certDeg(v); v += 1 }
    val certAdj = new Array[Int](certOffsets(n))
    val ccur = certOffsets.clone()
    eid = 0
    while (eid < m) {
      if (inCert(eid)) {
        val a = edgeU(eid); val b = edgeV(eid)
        certAdj(ccur(a)) = b; ccur(a) += 1
        certAdj(ccur(b)) = a; ccur(b) += 1
      }
      eid += 1
    }
    v = 0
    while (v < n) { java.util.Arrays.sort(certAdj, certOffsets(v), certOffsets(v + 1)); v += 1 }
    val cert = AdjGraph.unsafe(g.ids, certOffsets, certAdj)

    // Side-groups: components of F_k with more than k members.
    val groups: Vector[Array[Int]] =
      if (lastForestComp == null) Vector.empty
      else {
        val byComp = new mutable.HashMap[Int, mutable.ArrayBuilder.ofInt]()
        var i = 0
        while (i < n) {
          byComp.getOrElseUpdate(lastForestComp(i), new mutable.ArrayBuilder.ofInt) += i
          i += 1
        }
        byComp.valuesIterator.map(_.result()).filter(_.length > k).toVector
      }
    Cert(cert, groups)
  }
}
