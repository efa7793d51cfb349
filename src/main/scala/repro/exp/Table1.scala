package repro.exp

import org.apache.spark.sql.SparkSession
import repro.gen.Datasets
import repro.spark.EdgeOps

/** Reproduces paper Table 1 (NETWORK STATISTICS): |V|, |E|, density = |E|/|V|
  * and maximum degree for each dataset — computed with Spark SQL over the
  * synthetic substitutes, printed next to the paper's numbers.
  */
object Table1 {

  final case class Row(spec: Datasets.DatasetSpec, stats: EdgeOps.GraphStats)

  def run(spark: SparkSession, scale: Double = ExpConfig.scale): Vector[Row] =
    ExpConfig.datasets.map { spec =>
      val edges = EdgeOps.toDF(spark, Datasets.generate(spec, scale))
      Row(spec, EdgeOps.stats(EdgeOps.canonicalize(edges)))
    }

  def render(rows: Seq[Row], scale: Double): String = {
    val header = Seq(
      "Dataset",
      "|V| (paper)", "|V| (ours)",
      "|E| (paper)", "|E| (ours)",
      "Density (paper)", "Density (ours)",
      "MaxDeg (paper)", "MaxDeg (ours)")
    val body = rows.map { r =>
      Seq(
        r.spec.name,
        r.spec.paperV.toString, r.stats.n.toString,
        r.spec.paperE.toString, r.stats.m.toString,
        f"${r.spec.paperDensity}%.2f", f"${r.stats.density}%.2f",
        r.spec.paperMaxDegree.toString, r.stats.maxDegree.toString)
    }
    Tables.render(f"Table 1: network statistics (synthetic substitutes at scale=$scale%.5f)", header, body)
  }

  def runAndEmit(spark: SparkSession): Vector[Row] = {
    val scale = ExpConfig.scale
    val rows = run(spark, scale)
    Tables.emit("table1_network_stats.txt", render(rows, scale))
    rows
  }
}
