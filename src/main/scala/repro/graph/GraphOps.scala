package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Small edge-DataFrame utilities shared by the enumeration engine and the
  * bench harness. An edge DataFrame always has schema `(src, dst)` bigint.
  */
object GraphOps {

  /** Reverse graph `G_r`: every edge flipped (Section II). */
  def reverse(edges: DataFrame): DataFrame =
    edges.select(col("dst") as "src", col("src") as "dst")

  /** Statistics row used by Table I: (|V|, |E|, d_avg, d_max). Degrees are
    * total (in + out), matching how undirected-style stats are usually
    * reported for these datasets.
    */
  final case class Stats(vertices: Long, edges: Long, dAvg: Double, dMax: Long)

  def stats(edges: DataFrame): Stats = {
    val e = edges.count()
    val ends = edges.select(col("src") as "v").unionAll(edges.select(col("dst") as "v"))
    val deg = ends.groupBy("v").agg(count(lit(1)) as "d")
    val row = deg.agg(count(lit(1)) as "n", max("d") as "dmax").head()
    val n = row.getLong(0)
    Stats(n, e, if (n == 0) 0.0 else e.toDouble / n, if (n == 0) 0L else row.getLong(1))
  }
}
