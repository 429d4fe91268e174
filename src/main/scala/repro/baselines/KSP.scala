package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.{Enumerator, PathQuery}
import repro.graph.{BFS, GraphOps}

/** Adapted k-shortest-path baselines of Exp-6 (Fig. 12).
  *
  * The paper adapts DkSP [34] and OnePass [35] "to the problem of HC-s-t
  * path enumeration by ignoring their similarity constraint and keeping
  * generating the path results until reaching the hop constraint". What the
  * experiment measures is that neither uses the HC-specific machinery —
  * bidirectional search and the hop-distance index pruning — and therefore
  * loses by orders of magnitude. Our adaptations keep exactly that trait
  * (see DESIGN.md §4):
  *
  *  - `onePass`: unidirectional expansion of *all* simple paths from `s` up
  *    to `k` hops with no pruning at all, filtered on arrival at `t`
  *    (OnePass enumerates candidate paths one pass per path without
  *    HC-aware pruning);
  *  - `dkSP`: unidirectional expansion pruned only by reachability of `t`
  *    (`dist(v,t) <= k - depth`), with that distance computed per query and
  *    not shared across the batch (DkSP's route-planning lower bound).
  */
object KSP {

  /** OnePass-adapted: exhaustive unidirectional enumeration. */
  def onePass(spark: SparkSession, edges: DataFrame, queries: Seq[PathQuery]): DataFrame = {
    val starts = queries.map(q => Enumerator.NodeStart(q.qid.toLong, q.s, q.k))
    val all = Enumerator.enumerate(spark, edges, starts, allowed = None)
    finish(spark, all, queries)
  }

  /** DkSP-adapted: unidirectional with per-query distance-to-target bound. */
  def dkSP(spark: SparkSession, edges: DataFrame, queries: Seq[PathQuery]): DataFrame = {
    import spark.implicits._
    val maxK = queries.map(_.k).max
    val roots = queries.map(q => (q.qid.toLong, q.t)).toDF("root", "v")
    val distToT = BFS.multiSource(GraphOps.reverse(edges), roots, maxK)
    val qdf = broadcast(queries.map(q => (q.qid.toLong, q.k)).toDF("root", "k"))
    val allowed = distToT.join(qdf, "root")
      .select(col("root") as "node", col("v"), (col("k") - col("dist")) as "maxDepth")
      .where(col("maxDepth") >= 0)
    val starts = queries.map(q => Enumerator.NodeStart(q.qid.toLong, q.s, q.k))
    val all = Enumerator.enumerate(spark, edges, starts, Some(allowed))
    finish(spark, all, queries)
  }

  private def finish(spark: SparkSession, all: DataFrame,
                     queries: Seq[PathQuery]): DataFrame = {
    import spark.implicits._
    val tgt = broadcast(queries.map(q => (q.qid.toLong, q.t)).toDF("qid", "t"))
    all.withColumnRenamed("node", "qid")
      .join(tgt, Seq("qid"))
      .where(col("last") === col("t") && col("len") >= 1)
      .select(col("qid"), col("path"))
      .localCheckpoint()
  }
}
