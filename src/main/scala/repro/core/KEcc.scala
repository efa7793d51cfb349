package repro.core

import repro.graph.{AdjGraph, GraphOps}
import scala.collection.mutable

/** k-edge connected components — the effectiveness baseline the paper
  * compares against (Figs. 7–9; Theorem 3 nests every k-VCC in a k-ECC).
  *
  * Cut-based decomposition: shrink to the k-core, split into connected
  * components, compute the global minimum edge cut (Stoer–Wagner); if its
  * value ≥ k the component is a k-ECC, otherwise remove the cut edges and
  * recurse on the pieces. k-ECCs are vertex-disjoint, so no overlap handling
  * is needed.
  */
object KEcc {

  def enumerate(g0: AdjGraph, k: Int): Vector[AdjGraph] = {
    require(k >= 1, s"k must be >= 1, got $k")
    val out = Vector.newBuilder[AdjGraph]
    val work = mutable.Stack[AdjGraph](g0)
    while (work.nonEmpty) {
      val g = work.pop()
      // Degree < k vertices cannot sit in a k-ECC (Whitney: λ ≤ δ).
      val h = GraphOps.kCore(g, k)
      for (comp <- GraphOps.componentSubgraphs(h) if comp.n >= 2) {
        val (cutWeight, side) = stoerWagner(comp)
        if (cutWeight >= k) out += comp
        else {
          // Remove the cut edges (side ↔ rest) and recurse on both sides'
          // induced subgraphs — equivalent to deleting the crossing edges.
          val inSide = new Array[Boolean](comp.n)
          side.foreach(inSide(_) = true)
          val a = (0 until comp.n).filter(inSide(_)).toArray
          val b = (0 until comp.n).filter(!inSide(_)).toArray
          if (a.nonEmpty) work.push(comp.induced(a))
          if (b.nonEmpty) work.push(comp.induced(b))
        }
      }
    }
    out.result()
  }

  /** Global minimum edge cut of a connected graph with ≥ 2 vertices.
    * Returns (cut weight, one side of the cut as local indices).
    * Classic Stoer–Wagner with O(n^3) maximum-adjacency phases — the
    * baseline only runs on small post-k-core components.
    */
  def stoerWagner(g: AdjGraph): (Int, Array[Int]) = {
    val n = g.n
    require(n >= 2, "stoerWagner needs >= 2 vertices")
    // Weighted adjacency between supernodes; merged(v) lists original members.
    val w = Array.fill(n)(new mutable.HashMap[Int, Int]())
    var v = 0
    while (v < n) {
      g.foreachNeighbor(v) { u => w(v).update(u, w(v).getOrElse(u, 0) + 1) }
      v += 1
    }
    val members = Array.tabulate(n)(i => mutable.ArrayBuffer(i))
    val alive = mutable.LinkedHashSet.empty[Int]
    (0 until n).foreach(alive += _)

    var bestCut = Int.MaxValue
    var bestSide: Array[Int] = Array.empty

    while (alive.size > 1) {
      // Maximum-adjacency ordering of the surviving supernodes.
      val inA = mutable.HashSet.empty[Int]
      val weightToA = new mutable.HashMap[Int, Int]()
      val order = new mutable.ArrayBuffer[Int](alive.size)
      def addToA(x: Int): Unit = {
        inA += x
        order += x
        weightToA.remove(x)
        w(x).foreach { case (u, wt) =>
          if (alive(u) && !inA(u)) weightToA.update(u, weightToA.getOrElse(u, 0) + wt)
        }
      }
      addToA(alive.head)
      var lastWeight = 0
      while (order.length < alive.size) {
        var pick = -1
        var pw = -1
        weightToA.foreach { case (u, ww) => if (ww > pw) { pw = ww; pick = u } }
        // A disconnected remainder would leave weightToA empty; the caller
        // guarantees connectivity, but fall back to any vertex defensively.
        if (pick == -1) { pick = alive.find(u => !inA(u)).get; pw = 0 }
        lastWeight = pw
        addToA(pick)
      }
      val t = order(order.length - 1)
      val s = order(order.length - 2)
      // Cut-of-the-phase: `t` alone versus the rest.
      if (lastWeight < bestCut) {
        bestCut = lastWeight
        bestSide = members(t).toArray
      }
      // Merge t into s (weights stay symmetric).
      alive -= t
      val tEdges = w(t).toVector
      tEdges.foreach { case (u, wt) =>
        if (alive(u) && u != s) {
          val nw = w(s).getOrElse(u, 0) + wt
          w(s).update(u, nw)
          w(u).update(s, nw)
        }
        w(u).remove(t)
      }
      w(s).remove(t)
      members(s) ++= members(t)
    }
    (bestCut, bestSide)
  }
}
