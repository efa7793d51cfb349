package repro.core

import repro.SparkSpec
import repro.gen.GraphGen
import repro.graph.{AdjGraph, GraphOps}
import scala.util.Random

/** Structural properties from Section 2.2 + cross-variant equivalence on
  * graphs too large for the brute-force oracle.
  */
class KVCCPropertiesSpec extends SparkSpec {

  private def mediumPlanted(seed: Long, blocks: Int = 6, k: Int = 4): AdjGraph = {
    val rnd = new Random(seed)
    val specs = Vector.fill(blocks) {
      val size = k + 4 + rnd.nextInt(6)
      GraphGen.BlockSpec(size, 0.8, overlap = 1 + rnd.nextInt(k - 1))
    }
    val planted = GraphGen.plantedBlocks(specs, rnd)
    AdjGraph.fromEdges(planted.edges)
  }

  // --- cross-variant equivalence (the sweeps must never change the result) ---

  for (seed <- 1 to 15; k <- Seq(3, 4, 5)) {
    test(s"all variants produce the same k-VCC set (seed=$seed, k=$k)") {
      val g = mediumPlanted(seed, blocks = 5 + seed % 3, k = k)
      val reference = KVCCEnumerator.canonical(KVCCEnumerator.enumerate(g, k, Variant.Basic))
      for (variant <- Variant.all.drop(1)) {
        val got = KVCCEnumerator.canonical(KVCCEnumerator.enumerate(g, k, variant))
        assert(got == reference, s"${variant.name} diverges from VCCE")
      }
    }
  }

  for (seed <- 1 to 10) {
    test(s"variants agree on ER graphs (seed=$seed)") {
      val g = AdjGraph.fromEdges(GraphGen.erdosRenyi(24, 0.3, seed * 7))
      for (k <- Seq(3, 4)) {
        val reference = KVCCEnumerator.canonical(KVCCEnumerator.enumerate(g, k, Variant.Basic))
        for (variant <- Variant.all.drop(1)) {
          assert(KVCCEnumerator.canonical(KVCCEnumerator.enumerate(g, k, variant)) == reference,
            s"${variant.name} k=$k")
        }
      }
    }
  }

  // --- structural properties of every enumerated k-VCC ---

  private def forAllResults(f: (AdjGraph, Int, Vector[AdjGraph]) => Unit): Unit = {
    for (seed <- 1 to 8; k <- Seq(3, 4)) {
      val g = mediumPlanted(seed * 11, blocks = 6, k = k)
      val res = KVCCEnumerator.enumerate(g, k, Variant.Star)
      f(g, k, res)
    }
  }

  test("each result is k-vertex connected (Lemma 1)") {
    forAllResults { (_, k, res) =>
      res.foreach { vcc =>
        assert(vcc.n > k)
        assert(VertexConnectivity.kappa(vcc) >= k, s"|V|=${vcc.n} κ=${VertexConnectivity.kappa(vcc)} < $k")
      }
    }
  }

  test("results are subgraphs of the input with induced edges") {
    forAllResults { (g, _, res) =>
      val edgeSet = g.edgeList.toSet
      res.foreach { vcc =>
        vcc.edgeList.foreach(e => assert(edgeSet.contains(e)))
        // Induced: any input edge between two member vertices is present.
        val members = vcc.ids.toSet
        g.edgeList.foreach { case (a, b) =>
          if (members.contains(a) && members.contains(b))
            assert(vcc.hasEdge(vcc.ids.indexOf(a), vcc.ids.indexOf(b)))
        }
      }
    }
  }

  test("pairwise overlap is smaller than k (Property 1)") {
    forAllResults { (_, k, res) =>
      for (i <- res.indices; j <- i + 1 until res.length) {
        val overlap = res(i).ids.toSet.intersect(res(j).ids.toSet)
        assert(overlap.size < k, s"overlap=${overlap.size} >= $k")
      }
    }
  }

  test("no result contains another (Lemma 3, redundancy-free)") {
    forAllResults { (_, _, res) =>
      for (i <- res.indices; j <- res.indices if i != j) {
        assert(!res(i).ids.toSet.subsetOf(res(j).ids.toSet))
      }
    }
  }

  test("component count is below n/2 (Theorem 6)") {
    forAllResults { (g, _, res) => assert(res.length <= g.n / 2) }
  }

  test("diameter bound (Theorem 2)") {
    forAllResults { (_, _, res) =>
      res.foreach { vcc =>
        val kappa = VertexConnectivity.kappa(vcc)
        val bound = (vcc.n - 2) / kappa + 1
        assert(GraphOps.diameter(vcc) <= bound)
      }
    }
  }

  test("each k-VCC is nested in a k-core and in a k-ECC (Theorem 3)") {
    forAllResults { (g, k, res) =>
      val core = GraphOps.kCore(g, k).ids.toSet
      val eccs = KEcc.enumerate(g, k).map(_.ids.toSet)
      res.foreach { vcc =>
        val ids = vcc.ids.toSet
        assert(ids.subsetOf(core), "k-VCC not inside the k-core")
        assert(eccs.exists(ids.subsetOf(_)), "k-VCC not inside any k-ECC")
        assert(vcc.minDegree >= k, "k-VCC must itself be a k-core")
      }
    }
  }

  test("stats counters accumulate across a run") {
    val g = mediumPlanted(5, blocks = 6, k = 4)
    val stats = new KvccStats
    KVCCEnumerator.enumerate(g, 4, Variant.Star, stats)
    assert(stats.globalCutCalls > 0)
    assert(stats.phase1Processed > 0)
    val total = stats.proportionNs1 + stats.proportionNs2 + stats.proportionGs + stats.proportionNonPruned
    assert(total <= 1.0 + 1e-9)
  }

  test("sweeps reduce the number of flow tests") {
    val g = mediumPlanted(9, blocks = 8, k = 4)
    val basic = new KvccStats
    KVCCEnumerator.enumerate(g, 4, Variant.Basic, basic)
    val star = new KvccStats
    KVCCEnumerator.enumerate(g, 4, Variant.Star, star)
    assert(star.flowTests <= basic.flowTests,
      s"VCCE* ran ${star.flowTests} flow tests, VCCE ${basic.flowTests}")
  }
}
