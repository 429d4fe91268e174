package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

import repro.graph.{BFS, GraphOps}

/** The distance index of Section III: `dist_G(s, v)` for every query source
  * `s` and `dist_{G_r}(t, v)` for every query target `t`, capped at the
  * maximum hop constraint. Vertices absent from a table have distance
  * infinity (they are dropped by the inner pruning joins downstream).
  *
  * `fwd`/`bwd` have schema `(root, v, dist)`. In shared mode (BasicEnum,
  * BatchEnum — Alg. 1/4 lines 1–2) `root` is the source/target *vertex*, so
  * queries sharing an endpoint share the BFS. In per-query mode (the
  * PathEnum baseline, which builds its index independently per query)
  * `root` is the query id, so shared endpoints are recomputed — exactly the
  * sharing difference the paper measures between PathEnum and BasicEnum.
  */
final case class DistIndex(fwd: DataFrame, bwd: DataFrame, maxHops: Int) {
  def persist(): DistIndex = {
    fwd.persist(StorageLevel.MEMORY_AND_DISK).count()
    bwd.persist(StorageLevel.MEMORY_AND_DISK).count()
    this
  }
  def unpersist(): Unit = { fwd.unpersist(); bwd.unpersist() }

  /** Cumulative forward-frontier sizes per root: f(root)(i) = #vertices at
    * distance <= i. Used by the optimized search-order split (BasicEnum+).
    */
  def frontierSizes(df: DataFrame): Map[Long, Array[Long]] = {
    val rows = df.groupBy("root", "dist").agg(count(lit(1)) as "c").collect()
    rows.groupBy(_.getLong(0)).map { case (root, rs) =>
      val byDist = rs.map(r => r.getInt(1) -> r.getLong(2)).toMap
      val cum = new Array[Long](maxHops + 1)
      var acc = 0L
      for (i <- 0 to maxHops) { acc += byDist.getOrElse(i, 0L); cum(i) = acc }
      root -> cum
    }
  }
}

object DistIndex {

  /** Shared index: one BFS identity per distinct endpoint vertex. */
  def shared(spark: SparkSession, edges: DataFrame, queries: Seq[PathQuery]): DistIndex = {
    import spark.implicits._
    val maxK = queries.map(_.k).max
    val srcRoots = queries.map(_.s).distinct.map(v => (v, v)).toDF("root", "v")
    val tgtRoots = queries.map(_.t).distinct.map(v => (v, v)).toDF("root", "v")
    DistIndex(
      BFS.multiSource(edges, srcRoots, maxK),
      BFS.multiSource(GraphOps.reverse(edges), tgtRoots, maxK),
      maxK,
    )
  }

  /** Per-query index (PathEnum mode): one BFS identity per query, even when
    * endpoints coincide across queries.
    */
  def perQuery(spark: SparkSession, edges: DataFrame, queries: Seq[PathQuery]): DistIndex = {
    import spark.implicits._
    val maxK = queries.map(_.k).max
    val srcRoots = queries.map(q => (q.qid.toLong, q.s)).toDF("root", "v")
    val tgtRoots = queries.map(q => (q.qid.toLong, q.t)).toDF("root", "v")
    DistIndex(
      BFS.multiSource(edges, srcRoots, maxK),
      BFS.multiSource(GraphOps.reverse(edges), tgtRoots, maxK),
      maxK,
    )
  }
}
