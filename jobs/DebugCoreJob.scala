package repro.jobs

import repro.core.{KVCCEnumerator, KvccStats, Variant}
import repro.gen.Datasets
import repro.graph.{AdjGraph, GraphOps}

/** Diagnostic: post-k-core structure of a dataset substitute + per-variant
  * counter breakdown.
  */
object DebugCoreJob {
  def main(args: Array[String]): Unit = {
    val spec = Datasets.byName(if (args.nonEmpty) args(0) else "Cit")
    val g = AdjGraph.fromEdges(Datasets.generate(spec))
    println(s"${spec.name}: n=${g.n} m=${g.m} maxDeg=${g.maxDegree}")
    for (k <- Seq(20, 25, 30, 35, 40)) {
      val core = GraphOps.kCore(g, k)
      val comps = GraphOps.componentSubgraphs(core)
      val sizes = comps.map(_.n).sorted.reverse
      println(s"  k=$k: core n=${core.n} m=${core.m} comps=${comps.length} " +
        s"top sizes=${sizes.take(8).mkString(",")} maxDeg=${core.maxDegree}")
    }
    val kProfile = if (args.length >= 2) args(1).toInt else 20
    KVCCEnumerator.enumerate(g, kProfile, Variant.Star) // warmup
    for (variant <- Variant.all) {
      val stats = new KvccStats
      val t0 = System.nanoTime()
      val res = KVCCEnumerator.enumerate(g, kProfile, variant, stats)
      val ms = (System.nanoTime() - t0) / 1e6
      println(f"  k=$kProfile ${variant.name}%-7s: $ms%7.0f ms, ${res.length} k-VCCs, $stats")
    }
  }
}
