package repro.core

import repro.graph.AdjGraph
import scala.collection.mutable

/** Directed flow graph for local vertex-connectivity testing (Section 4.1).
  *
  * Every vertex `v` of the input graph splits into `v_in = 2v` and
  * `v_out = 2v+1` joined by an arc of capacity 1; every undirected edge
  * `(u,v)` becomes arcs `u_out→v_in` and `v_out→u_in`. Adjacency arcs get
  * capacity `n` (≫ any cut of interest) so every minimum cut consists solely
  * of vertex-split arcs and therefore maps 1:1 to a vertex cut — Even's
  * classic construction; the cut *value* is identical to the paper's
  * all-capacity-1 variant.
  *
  * Max-flow is BFS augmentation (Edmonds–Karp) with early termination at a
  * caller-supplied bound `k`: each augmenting path carries exactly one unit
  * (it must traverse a capacity-1 vertex arc), so a LOC-CUT test costs
  * O(k·m). The network is built once per GLOBAL-CUT invocation and reset
  * between flow computations.
  */
final class FlowNetwork(g: AdjGraph) {
  private val numNodes = 2 * g.n
  private val numArcs = 2 * (g.n + 2 * g.m) // forward + residual twins

  // Arc storage: paired arcs (i, i^1); arc i^1 is the residual twin of i.
  private val arcTo = new Array[Int](numArcs)
  private val arcCap = new Array[Int](numArcs)
  private val arcFlow = new Array[Int](numArcs)
  private val head = Array.fill(numNodes)(-1) // head of per-node arc list
  private val next = new Array[Int](numArcs)

  private var arcCount = 0
  private val bigCap = math.max(2, g.n)

  private def addArc(from: Int, to: Int, cap: Int): Unit = {
    arcTo(arcCount) = to; arcCap(arcCount) = cap
    next(arcCount) = head(from); head(from) = arcCount; arcCount += 1
    arcTo(arcCount) = from; arcCap(arcCount) = 0
    next(arcCount) = head(to); head(to) = arcCount; arcCount += 1
  }

  locally {
    var v = 0
    while (v < g.n) {
      addArc(2 * v, 2 * v + 1, 1) // vertex-split arc, capacity 1
      v += 1
    }
    v = 0
    while (v < g.n) {
      g.foreachNeighbor(v) { w =>
        // Add each undirected edge once; it contributes two directed arcs.
        if (v < w) {
          addArc(2 * v + 1, 2 * w, bigCap)
          addArc(2 * w + 1, 2 * v, bigCap)
        }
      }
      v += 1
    }
  }

  // Scratch space reused across flow computations.
  private val parentArc = new Array[Int](numNodes)
  private val bfsQueue = new Array[Int](numNodes)

  /** Zero all flow (start a fresh computation). */
  def reset(): Unit = java.util.Arrays.fill(arcFlow, 0)

  /** Residual BFS from `s`; fills `parentArc` and returns true iff `t` reached. */
  private def bfs(s: Int, t: Int): Boolean = {
    java.util.Arrays.fill(parentArc, -1)
    parentArc(s) = -2
    var qh = 0; var qt = 0
    bfsQueue(qt) = s; qt += 1
    while (qh < qt) {
      val u = bfsQueue(qh); qh += 1
      var a = head(u)
      while (a != -1) {
        val v = arcTo(a)
        if (parentArc(v) == -1 && arcCap(a) - arcFlow(a) > 0) {
          parentArc(v) = a
          if (v == t) return true
          bfsQueue(qt) = v; qt += 1
        }
        a = next(a)
      }
    }
    false
  }

  /** Max flow from `u_out` to `v_in` for original vertices u≠v, stopping early
    * once the flow reaches `limit`. Callers must `reset()` first.
    */
  def maxFlowUpTo(u: Int, v: Int, limit: Int): Int = {
    val s = 2 * u + 1
    val t = 2 * v
    var flow = 0
    while (flow < limit && bfs(s, t)) {
      // Each augmenting path has unit bottleneck (it crosses a vertex arc).
      var node = t
      while (node != s) {
        val a = parentArc(node)
        arcFlow(a) += 1
        arcFlow(a ^ 1) -= 1
        node = arcTo(a ^ 1)
      }
      flow += 1
    }
    flow
  }

  /** Vertices whose split arcs cross the residual min cut after a maxed-out
    * flow from `u_out` to `v_in`. Only valid right after `maxFlowUpTo`
    * returned a value < its limit (i.e. the flow is truly maximum).
    */
  def minCutVertices(u: Int): Array[Int] = {
    val s = 2 * u + 1
    // Residual reachability from s.
    val reached = new Array[Boolean](numNodes)
    reached(s) = true
    var qh = 0; var qt = 0
    bfsQueue(qt) = s; qt += 1
    while (qh < qt) {
      val x = bfsQueue(qh); qh += 1
      var a = head(x)
      while (a != -1) {
        val y = arcTo(a)
        if (!reached(y) && arcCap(a) - arcFlow(a) > 0) {
          reached(y) = true
          bfsQueue(qt) = y; qt += 1
        }
        a = next(a)
      }
    }
    // Adjacency arcs have capacity n and can never be saturated by a flow
    // < n, so every crossing arc is a vertex-split arc w_in→w_out.
    val cut = mutable.ArrayBuilder.make[Int]
    var w = 0
    while (w < g.n) {
      if (reached(2 * w) && !reached(2 * w + 1)) cut += w
      w += 1
    }
    cut.result()
  }
}
