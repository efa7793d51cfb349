package repro.core

import repro.SparkSpec
import repro.gen.GraphGen
import repro.graph.{AdjGraph, GraphOps}
import scala.util.Random

class SparseCertificateSpec extends SparkSpec {

  private def randomConnected(n: Int, p: Double, seed: Long): AdjGraph =
    AdjGraph.fromEdges(
      GraphGen.erdosRenyi(n, p, seed) ++ (0 until n - 1).map(i => (i.toLong, (i + 1).toLong)))

  test("certificate is a subgraph with at most k(n-1) edges") {
    for (seed <- 1 to 10; k <- Seq(1, 2, 3, 5)) {
      val g = randomConnected(15, 0.4, seed)
      val cert = SparseCertificate.compute(g, k).graph
      assert(cert.n == g.n)
      assert(cert.m <= k * (g.n - 1), s"seed=$seed k=$k m=${cert.m}")
      assert(cert.m <= g.m)
      val edges = g.edgeList.toSet
      cert.edgeList.foreach(e => assert(edges.contains(e)))
    }
  }

  test("certificate of a sparse graph is the graph itself") {
    val tree = AdjGraph.fromEdges((0 until 9).map(i => (i.toLong, (i + 1).toLong)))
    val cert = SparseCertificate.compute(tree, 3).graph
    assert(cert.m == tree.m)
  }

  test("certificate min degree is min(k, original degree)") {
    for (seed <- 1 to 5; k <- Seq(2, 3, 4)) {
      val g = randomConnected(14, 0.6, seed)
      val cert = SparseCertificate.compute(g, k).graph
      (0 until g.n).foreach { v =>
        assert(cert.degree(v) >= math.min(k, g.degree(v)), s"v=$v seed=$seed k=$k")
      }
    }
  }

  for (seed <- 1 to 15; k <- Seq(2, 3)) {
    test(s"certificate preserves k-vertex connectivity (seed=$seed, k=$k)") {
      val g = randomConnected(9, 0.45, seed * 13)
      val cert = SparseCertificate.compute(g, k).graph
      val kg = BruteForce.kappaNaive(g)
      val kc = BruteForce.kappaNaive(cert)
      assert(math.min(kg, k) == math.min(kc, k), s"κ(G)=$kg κ(cert)=$kc")
    }
  }

  for (seed <- 1 to 12) {
    test(s"STRONG certificate: G-S and SC-S have identical components for |S|<k (seed=$seed)") {
      val k = 3
      val g = randomConnected(10, 0.4, seed * 17)
      val cert = SparseCertificate.compute(g, k).graph
      val rnd = new Random(seed)
      // All subsets of size < k on a small graph.
      for (size <- 0 until k; s <- (0 until g.n).combinations(size)) {
        val keep = (0 until g.n).filter(v => !s.contains(v)).toArray
        val gComps = GraphOps.connectedComponents(g.induced(keep))
          .map(_.map(keep(_)).toSet).toSet
        val cComps = GraphOps.connectedComponents(cert.induced(keep))
          .map(_.map(keep(_)).toSet).toSet
        assert(gComps == cComps, s"S=${s.toList}")
      }
      rnd.nextInt() // silence unused warning
    }
  }

  for (seed <- 1 to 10) {
    test(s"side-groups: all members pairwise k-local-connected in the certificate (seed=$seed)") {
      val k = 3
      val g = randomConnected(12, 0.5, seed * 29)
      val SparseCertificate.Cert(cert, groups) = SparseCertificate.compute(g, k)
      groups.foreach { grp =>
        assert(grp.length > k)
        val fn = new FlowNetwork(cert)
        for (i <- grp.indices; j <- i + 1 until grp.length) {
          val c = LocalConnectivity.connectivityUpTo(fn, cert, grp(i), grp(j), k)
          assert(c >= k, s"pair (${grp(i)},${grp(j)}) has κ=$c < $k in certificate")
        }
      }
    }
  }

  test("side-groups only contain groups larger than k") {
    for (seed <- 1 to 5; k <- Seq(2, 3, 4)) {
      val g = randomConnected(14, 0.5, seed)
      val groups = SparseCertificate.compute(g, k).sideGroups
      groups.foreach(grp => assert(grp.length > k))
      // Groups are disjoint.
      val all = groups.flatten
      assert(all.distinct.length == all.length)
    }
  }
}
