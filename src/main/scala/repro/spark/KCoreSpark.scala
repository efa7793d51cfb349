package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed k-core (Algorithm 1, line 2) as an iterative DataFrame
  * computation: repeatedly drop vertices of degree < k and the edges touching
  * them until a fixpoint. Each iteration is a degree aggregation plus two
  * semi-joins; lineage is cut with localCheckpoint to keep plans bounded.
  */
object KCoreSpark {

  /** Canonical edge table of the k-core of `edges` (canonical in, canonical out). */
  def kCore(edges: DataFrame, k: Int, maxIter: Int = 10000): DataFrame = {
    require(k >= 1, s"k must be >= 1, got $k")
    var cur = EdgeOps.canonicalize(edges).localCheckpoint()
    var curCount = cur.count()
    var it = 0
    var done = curCount == 0
    while (!done && it < maxIter) {
      val keep = EdgeOps.degrees(cur)
        .where(col("degree") >= k)
        .select(col("vertex"))
      val next = cur
        .join(keep.withColumnRenamed("vertex", "src"), usingColumns = Seq("src"), joinType = "left_semi")
        .join(keep.withColumnRenamed("vertex", "dst"), usingColumns = Seq("dst"), joinType = "left_semi")
        .select(col("src"), col("dst"))
        .localCheckpoint()
      val nextCount = next.count()
      done = nextCount == curCount
      cur = next
      curCount = nextCount
      it += 1
    }
    require(it < maxIter, s"k-core did not converge in $maxIter iterations")
    cur
  }
}
