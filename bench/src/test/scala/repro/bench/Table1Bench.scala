package repro.bench

import repro.SparkSpec
import repro.exp.{ExpConfig, Table1}

/** Paper Table 1 (NETWORK STATISTICS) over the synthetic substitutes,
  * computed with Spark SQL. Prints paper-vs-measured side by side and
  * persists bench/results/table1_network_stats.txt.
  */
class Table1Bench extends SparkSpec {

  test("Table 1: network statistics") {
    val rows = Table1.runAndEmit(spark)
    assert(rows.length == ExpConfig.datasets.length)
    rows.foreach { r =>
      // The substitutes must track the scaled statistics, not just exist.
      val scale = ExpConfig.scale
      val targetV = math.max(500L, (r.spec.paperV * scale).toLong)
      val targetE = math.max(2000L, (r.spec.paperE * scale).toLong)
      assert(r.stats.n > targetV / 3 && r.stats.n < targetV * 3,
        s"${r.spec.name}: |V|=${r.stats.n} vs target $targetV")
      assert(r.stats.m > targetE / 3 && r.stats.m < targetE * 3,
        s"${r.spec.name}: |E|=${r.stats.m} vs target $targetE")
      // Density should be within ~3x of the paper's column (it is scale-free).
      assert(r.stats.density > r.spec.paperDensity / 3 && r.stats.density < r.spec.paperDensity * 3,
        s"${r.spec.name}: density=${r.stats.density} vs paper ${r.spec.paperDensity}")
    }
    // The relative density ordering of the extremes is preserved:
    // Cnr (9.88) densest, Youtube (2.63) sparsest in the paper.
    val byName = rows.map(r => r.spec.name -> r.stats.density).toMap
    assert(byName("Cnr") > byName("Youtube"))
  }
}
