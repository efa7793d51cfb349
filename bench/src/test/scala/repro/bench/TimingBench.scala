package repro.bench

import repro.SparkSpec
import repro.core.Variant
import repro.exp.TimingExp

/** Figure-10-shaped efficiency comparison (as a table): VCCE vs VCCE-N vs
  * VCCE-G vs VCCE* per dataset and k. Persists bench/results/fig10_timing.txt.
  */
class TimingBench extends SparkSpec {

  test("Fig 10 shape: sweep variants outperform the basic algorithm") {
    val rows = TimingExp.runAndEmit()
    assert(rows.nonEmpty)
    // Aggregate shape check (per-row timings are noisy): summed over the
    // whole sweep, VCCE* must clearly beat VCCE.
    val basicTotal = rows.map(_.millisByVariant(Variant.Basic.name)).sum
    val starTotal = rows.map(_.millisByVariant(Variant.Star.name)).sum
    assert(starTotal < basicTotal,
      f"VCCE* total $starTotal%.0f ms not faster than VCCE total $basicTotal%.0f ms")
    // Both single-strategy variants should also win in aggregate.
    val nTotal = rows.map(_.millisByVariant(Variant.NeighborSweep.name)).sum
    val gTotal = rows.map(_.millisByVariant(Variant.GroupSweep.name)).sum
    assert(nTotal < basicTotal, "VCCE-N slower than VCCE in aggregate")
    assert(gTotal < basicTotal, "VCCE-G slower than VCCE in aggregate")
  }
}
