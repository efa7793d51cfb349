package repro.bench

import repro.SparkSpec
import repro.exp.EffectivenessExp

/** Figures-7/8/9-shaped experiment: cohesiveness of k-core vs k-ECC vs k-VCC.
  * Persists bench/results/fig7_9_effectiveness.txt.
  */
class EffectivenessBench extends SparkSpec {

  test("Figs 7-9 shape: k-VCCs are the most cohesive of the three models") {
    val rows = EffectivenessExp.runAndEmit()
    val byKey = rows.map(r => (r.k, r.model) -> r).toMap
    val ks = rows.map(_.k).distinct.sorted
    ks.foreach { k =>
      val core = byKey((k, "k-core"))
      val ecc = byKey((k, "k-ECC"))
      val vcc = byKey((k, "k-VCC"))
      if (vcc.count > 0 && core.count > 0) {
        // Densities: k-VCC >= k-ECC >= k-core (paper Fig. 8 ordering).
        assert(vcc.avgDensity >= ecc.avgDensity - 1e-9, s"k=$k: VCC vs ECC density")
        assert(ecc.avgDensity >= core.avgDensity - 1e-9, s"k=$k: ECC vs core density")
        // Diameters: k-VCC has the smallest average diameter (Fig. 7).
        assert(vcc.avgDiam <= core.avgDiam + 1e-9, s"k=$k: VCC vs core diameter")
        assert(vcc.avgDiam <= ecc.avgDiam + 1e-9, s"k=$k: VCC vs ECC diameter")
        // Clustering coefficient: k-VCC largest (Fig. 9). Averaging across a
        // different number of subgraphs makes this noisier than density on
        // the synthetic fixture, so allow a small tolerance.
        assert(vcc.avgClustering >= core.avgClustering - 0.05, s"k=$k: clustering")
      }
    }
  }
}
