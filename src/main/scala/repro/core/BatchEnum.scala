package repro.core

import java.util.concurrent.atomic.AtomicLong

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

import repro.graph.GraphOps

/** Algorithm 4 (`BatchEnum`) — batch HC-s-t path enumeration with HC-s path
  * sharing, plus `BatchEnum+` (`optimized = true`, the cost-based search
  * order of BasicEnum+).
  *
  * Pipeline (with per-phase timings for Exp-3):
  *  1. BuildIndex — shared multi-source BFS index (lines 1–2);
  *  2. ClusterQuery — Algorithm 2 (line 3);
  *  3. IdentifySubquery — Algorithm 3 per cluster and direction (lines 4–5);
  *  4. Enumeration — Ψ nodes in topological levels, one dataflow per level,
  *     stitching dominator caches (lines 6–24), then per-query `⊕`
  *     concatenation and the final duplicate-vertex filter (lines 11–13).
  *
  * Cache lifetime: the paper refcounts per-query cache entries (lines
  * 14–16); we persist level results and unpersist everything when the batch
  * finishes — same asymptotic footprint at batch granularity, and Spark's
  * block manager spills under pressure.
  */
object BatchEnum {

  final case class Result(paths: DataFrame, timings: PhaseTimings,
                          clusters: Vector[Vector[PathQuery]],
                          psiNodes: Int, psiEdges: Int)

  private def timed[T](body: => T): (T, Long) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1000000L)
  }

  /** Enumerate one direction for all clusters: detection already done, the
    * sharing graphs' nodes run level-by-level with stitching.
    * Returns `(qid, path, last, len)` rows for every query binding.
    */
  private def enumerateDirection(
      spark: SparkSession,
      edges: DataFrame,
      index: DataFrame, // goal-rooted distances: (root=goal vertex, v, dist)
      graphs: Seq[(SharingGraph, Map[Int, PathQuery])], // psi + its cluster's queries by qid
      goalOf: PathQuery => Long,
  ): DataFrame = {
    import spark.implicits._

    // Consumer goals and pruning slack per node, propagated dominator-ward
    // (child serves parent ⇒ child inherits parent's goals with the stitch
    // depth subtracted from the slack). Conservative (max) — a superset of
    // each consumer's Lemma 3.1 bound, see DESIGN.md §3.
    val goalSlack = scala.collection.mutable.Map[(Long, Long), Int]() // (node, goal) -> slack
    for ((psi, qByQid) <- graphs) {
      val boundGoals: Map[Long, Seq[(Long, Int)]] =
        psi.bindings.toSeq.groupBy(_._2._1).map { case (nid, bs) =>
          nid -> bs.map { case (qid, _) => val q = qByQid(qid); (goalOf(q), q.k) }
        }
      val order = psi.topoLevels().toSeq.sortBy(-_._2).map(_._1) // parents first
      for (nid <- order) {
        for ((g, k) <- boundGoals.getOrElse(nid, Nil)) {
          val key = (nid, g)
          goalSlack(key) = math.max(goalSlack.getOrElse(key, Int.MinValue), k)
        }
        for (e <- psi.dominators(nid); (pg, ps) <- goalSlack.toSeq.filter(_._1._1 == nid)) {
          val key = (e.child, pg._2)
          goalSlack(key) = math.max(goalSlack.getOrElse(key, Int.MinValue), ps - e.depthInParent)
        }
      }
    }

    val gsDf = goalSlack.toSeq.map { case ((n, g), s) => (n, g, s) }
      .toDF("node", "goal", "slack")
    val allowed = broadcast(gsDf)
      .join(index, col("goal") === index("root"))
      .groupBy(col("node"), col("v"))
      .agg(max(col("slack") - col("dist")) as "maxDepth")
      .where(col("maxDepth") >= 1)
      .persist(StorageLevel.MEMORY_AND_DISK)

    // One length-synchronized pass over every Ψ node of this direction —
    // the Enumerator resolves stitch dependencies by path length, which
    // subsumes Alg. 4's explicit topological order (see Enumerator docs).
    val starts = graphs.flatMap { case (psi, _) =>
      psi.nodes.values.map(n => Enumerator.NodeStart(n.id, n.vertex, n.budget))
    }
    val stitches = graphs.flatMap { case (psi, _) =>
      psi.edges.groupBy(e => (e.parent, psi.nodes(e.child).vertex)).values.map { es =>
        val best = es.maxBy(e => psi.nodes(e.child).budget)
        Enumerator.Stitch(best.parent, psi.nodes(best.child).vertex, best.child)
      }
    }
    val all = Enumerator.enumerate(spark, edges, starts, Some(allowed), stitches)

    // Re-key node results to query ids, honoring each query's own budget.
    val binds = graphs.flatMap { case (psi, _) =>
      psi.bindings.map { case (qid, (nid, useB)) => (qid.toLong, nid, useB) }
    }.toDF("qid", "node", "useBudget")
    val out = all.join(broadcast(binds), Seq("node"))
      .where(col("len") <= col("useBudget"))
      .select(col("qid"), col("path"), col("last"), col("len"))
      .localCheckpoint()
    allowed.unpersist()
    out
  }

  def run(spark: SparkSession, edges: DataFrame, queries: Seq[PathQuery],
          gamma: Double = 0.5, optimized: Boolean = false): Result = {
    require(queries.map(_.qid).distinct.size == queries.size, "duplicate qids")
    import spark.implicits._

    // -- Phase 1: BuildIndex ------------------------------------------------
    val (index, tIndex) = timed(DistIndex.shared(spark, edges, queries).persist())

    try {
      // -- Phase 2: ClusterQuery ---------------------------------------------
      val (clusters, tCluster) = timed {
        val sim = Cluster.similarityMatrix(index, queries)
        Cluster.clusterQueries(queries, sim, gamma)
      }

      // -- Phase 3: IdentifySubquery -------------------------------------------
      val splits = BasicEnum.splitsFor(queries, index, optimized, perQueryIndex = false)
      val aOf = splits.map(s => s.qid -> s.a).toMap
      val ids = new AtomicLong(0)
      val edgesRev = GraphOps.reverse(edges)

      val ((psiFwd, psiBwd), tDetect) = timed {
        // Per-cluster min distance to the cluster's goal vertices, one
        // dataflow for all clusters: (cid, v, md).
        def minDist(df: DataFrame, goals: Seq[(Int, Long)]) = {
          val g = broadcast(goals.toDF("cid", "goal"))
          df.join(g, df("root") === g("goal"))
            .groupBy(col("cid"), col("v")).agg(min(col("dist")) as "md")
        }
        def run(dirEdges: DataFrame, goalIdx: DataFrame,
                anchor: PathQuery => Long, budget: PathQuery => Int,
                goal: PathQuery => Long, opposite: PathQuery => Int) = {
          val inputs = clusters.zipWithIndex.map { case (c, cid) =>
            Detect.ClusterInput(cid,
              c.map(q => Detect.DirQuery(q.qid, anchor(q), budget(q))),
              c.map(opposite).max)
          }
          val goals = clusters.zipWithIndex.flatMap { case (c, cid) =>
            c.map(q => (cid, goal(q))).distinct
          }
          val psis = Detect.detectAll(spark, dirEdges, inputs,
            minDist(goalIdx, goals), ids)
          clusters.zipWithIndex.map { case (c, cid) =>
            (psis(cid), c.map(q => q.qid -> q).toMap)
          }
        }
        val fwd = run(edges, index.bwd, _.s, q => aOf(q.qid), _.t, q => q.k - aOf(q.qid))
        val bwd = run(edgesRev, index.fwd, _.t, q => q.k - aOf(q.qid), _.s, q => aOf(q.qid))
        (fwd, bwd)
      }

      // -- Phase 4: Enumeration ------------------------------------------------
      val (paths, tEnum) = timed {
        val fwd = enumerateDirection(spark, edges, index.bwd, psiFwd, _.t)
        val bwd = enumerateDirection(spark, edgesRev, index.fwd, psiBwd, _.s)
        val res = Concat.assemble(spark, fwd, bwd, splits).localCheckpoint()
        res.count()
        res
      }

      val nPsi = (psiFwd ++ psiBwd).map(_._1.nodes.size).sum
      val ePsi = (psiFwd ++ psiBwd).map(_._1.edges.size).sum
      Result(paths, PhaseTimings(tIndex, tCluster, tDetect, tEnum), clusters, nPsi, ePsi)
    } finally index.unpersist()
  }
}
