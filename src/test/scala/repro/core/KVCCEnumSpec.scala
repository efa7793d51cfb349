package repro.core

import repro.SparkSpec
import repro.gen.GraphGen
import repro.graph.AdjGraph

/** Ground-truth validation of KVCC-ENUM against the subset-enumeration
  * oracle on small graphs, for every variant.
  */
class KVCCEnumSpec extends SparkSpec {

  private def asSets(result: Seq[AdjGraph]): Set[Set[Long]] =
    result.map(_.ids.toSet).toSet

  test("Fig. 2-style example: two 3-VCCs sharing a 2-cut") {
    // Two K5s sharing 2 vertices (ids 0,1): for k=3 both K5s are 3-VCCs.
    val rnd = new scala.util.Random(3)
    val a = GraphGen.erdosRenyi(IndexedSeq(0L, 1L, 10L, 11L, 12L), 1.0, rnd)
    val b = GraphGen.erdosRenyi(IndexedSeq(0L, 1L, 20L, 21L, 22L), 1.0, rnd)
    val g = AdjGraph.fromEdges(a ++ b)
    for (variant <- Variant.all) {
      val res = KVCCEnumerator.enumerate(g, 3, variant)
      assert(asSets(res) == Set(
        Set(0L, 1L, 10L, 11L, 12L),
        Set(0L, 1L, 20L, 21L, 22L)), variant.name)
    }
    // For k=2 the union is 2-connected: a single 2-VCC.
    for (variant <- Variant.all) {
      val res = KVCCEnumerator.enumerate(g, 2, variant)
      assert(asSets(res) == Set(g.ids.toSet), variant.name)
    }
  }

  test("a clique is its own k-VCC for all k < n") {
    val g = AdjGraph.fromEdges(GraphGen.erdosRenyi(7, 1.0, 1))
    for (k <- 1 to 6; variant <- Variant.all) {
      val res = KVCCEnumerator.enumerate(g, k, variant)
      assert(asSets(res) == Set(g.ids.toSet), s"${variant.name} k=$k")
    }
    for (variant <- Variant.all)
      assert(KVCCEnumerator.enumerate(g, 7, variant).isEmpty, variant.name)
  }

  test("k=1: each connected component with >= 2 vertices is a 1-VCC") {
    val g = AdjGraph.fromEdges(Seq((0L, 1L), (1L, 2L), (5L, 6L)))
    for (variant <- Variant.all) {
      val res = KVCCEnumerator.enumerate(g, 1, variant)
      assert(asSets(res) == Set(Set(0L, 1L, 2L), Set(5L, 6L)), variant.name)
    }
  }

  // Brute-force cross-validation: many random graphs, all variants.
  for (seed <- 1 to 30; k <- Seq(2, 3)) {
    test(s"matches brute-force oracle (seed=$seed, k=$k)") {
      val n = 6 + seed % 3 // 6..8 (keeps the exponential oracle cheap)
      val p = 0.3 + 0.07 * (seed % 5)
      val g = AdjGraph.fromEdges(
        GraphGen.erdosRenyi(n, p, seed * 37) ++
          (0 until n - 1).map(i => (i.toLong, (i + 1).toLong)))
      val expected = BruteForce.kvccNaive(g, k)
      for (variant <- Variant.all) {
        val got = asSets(KVCCEnumerator.enumerate(g, k, variant))
        assert(got == expected, s"${variant.name}: got=$got expected=$expected")
      }
    }
  }

  // Planted blocks: the enumeration must rediscover each block.
  for (seed <- 1 to 8; k <- Seq(3, 4)) {
    test(s"planted near-clique blocks are recovered (seed=$seed, k=$k)") {
      val planted = GraphGen.plantedTiny(k, blocks = 4, seed = seed)
      val g = AdjGraph.fromEdges(planted.edges)
      val res = KVCCEnumerator.enumerate(g, k, Variant.Star)
      // Every k-connected planted block must appear inside some k-VCC.
      planted.blockVertexSets.foreach { blk =>
        val sub = g.induced((0 until g.n).filter(v => blk.contains(g.ids(v))).toArray)
        if (VertexConnectivity.isKConnected(sub, k)) {
          assert(
            res.exists(r => blk.subsetOf(r.ids.toSet)),
            s"block $blk not contained in any k-VCC")
        }
      }
    }
  }
}
