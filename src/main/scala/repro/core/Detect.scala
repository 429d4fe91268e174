package repro.core

import java.util.concurrent.atomic.AtomicLong

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Common HC-s path query detection — Phase 2 (Algorithm 3).
  *
  * One level-synchronous BFS over `(cluster, node, vertex)` frontiers for
  * one direction, aligned on the *remaining hop budget* exactly as Alg. 3
  * iterates budget levels. All clusters run in the same dataflow (sharing
  * never crosses clusters — rows carry the cluster id); the sharing graphs
  * Ψ and the `M_Q` vertex→node maps live on the driver (small — Theorem 4.1
  * bounds each Ψ by one node per vertex).
  *
  * At each level `r` (descending):
  *  1. rows arriving at a vertex anchoring an existing node of the same
  *     cluster with budget `>= r` are *delegated* to it (Ψ edge;
  *     observation 2 / lines 20–22) — unless that edge would close a cycle
  *     (the `⊀` guard), in which case the search continues normally;
  *  2. vertices reached by ≥ 2 distinct remaining nodes of one cluster
  *     spawn a new dominating node `q_{v,r}` (observation 1 / lines 16–19),
  *     which takes over the suffix search from `v`;
  *  3. surviving rows extend one hop with per-node visited-set semantics
  *     (each node touches each vertex once — the complexity argument of
  *     Theorem 4.1), pruned by the cluster-wide distance bound
  *     `minDist(v, cluster goals) <= remaining + max opposite budget`,
  *     which is provably looser than the per-node bound used at
  *     enumeration time (DESIGN.md §3), so enumeration never escapes the
  *     detected region.
  */
object Detect {

  /** One query's contribution in one direction. */
  final case class DirQuery(qid: Int, anchor: Long, budget: Int)

  /** One cluster's inputs: its queries and the max budget of the *other*
    * direction (part of the pruning slack).
    */
  final case class ClusterInput(cid: Int, queries: Seq[DirQuery], maxOppositeBudget: Int)

  /** Detect sharing for all clusters in one direction.
    *
    * @param minDist `(cid, v, md)`: min hop distance from `v` to any goal
    *                vertex of cluster `cid` (targets for forward, sources
    *                for backward)
    * @return cluster id → its sharing graph
    */
  def detectAll(
      spark: SparkSession,
      edges: DataFrame,
      clusters: Seq[ClusterInput],
      minDist: DataFrame,
      ids: AtomicLong,
  ): Map[Int, SharingGraph] = {
    import spark.implicits._
    require(clusters.nonEmpty)

    val psis = clusters.map(c => c.cid -> new SharingGraph).toMap
    val byVertex = scala.collection.mutable.Map[(Int, Long), SharingGraph.Node]()
    val cidOfNode = scala.collection.mutable.Map[Long, Int]()

    // Initial HC-s path queries: one node per distinct anchor vertex per
    // cluster, carrying the max budget among its queries; smaller budgets
    // at the same vertex are served by a length filter at concat time
    // (Theorem 4.1's "derive q_{v,k'} from q_{v,k}" rule).
    val init = for {
      c <- clusters
      (v, qs) <- c.queries.groupBy(_.anchor)
    } yield {
      val n = SharingGraph.Node(ids.getAndIncrement(), v, qs.map(_.budget).max)
      psis(c.cid).addNode(n)
      byVertex((c.cid, v)) = n
      cidOfNode(n.id) = c.cid
      qs.foreach(q => psis(c.cid).bindings(q.qid) = (n.id, q.budget))
      (c.cid, n.id, n.vertex, n.budget)
    }

    val maxB = init.map(_._4).max
    // Materialize once — the pruning table is re-joined at every level.
    val md = minDist.select(col("cid") as "mcid", col("v") as "mv", col("md"))
      .localCheckpoint()
    val maxOpp = broadcast(clusters.map(c => (c.cid, c.maxOppositeBudget))
      .toDF("cid", "maxOpp"))

    var frontier = init.toDF("cid", "node", "v", "remaining").localCheckpoint()
    var seen = frontier.select(col("node"), col("v")).localCheckpoint()

    for (r <- maxB to 1 by -1) {
      val cur = frontier.where(col("remaining") === r)
      if (!cur.isEmpty) {
        val rows = cur.select("cid", "node", "v").collect()
          .map(x => (x.getInt(0), x.getLong(1), x.getLong(2)))

        // -- 1. delegation to existing anchored nodes ---------------------
        val delegated = scala.collection.mutable.Set[(Long, Long)]() // (node, v)
        for ((cid, nid, v) <- rows) byVertex.get((cid, v)) match {
          case Some(host) if host.id != nid && host.budget >= r =>
            val arriving = psis(cid).nodes(nid)
            if (psis(cid).addEdge(host.id, nid, arriving.budget - r))
              delegated += ((nid, v))
          case _ => ()
        }

        // -- 2. new dominating HC-s path queries --------------------------
        val live = rows.filterNot(x => delegated((x._2, x._3)))
        val extra = scala.collection.mutable.ArrayBuffer[(Int, Long, Long, Int)]()
        for (((cid, v), group) <- live.groupBy(x => (x._1, x._3)) if group.length >= 2
             if !byVertex.contains((cid, v))) {
          val psi = psis(cid)
          val nn = SharingGraph.Node(ids.getAndIncrement(), v, r)
          psi.addNode(nn)
          byVertex((cid, v)) = nn
          cidOfNode(nn.id) = cid
          group.foreach { case (_, nid, _) =>
            psi.addEdge(nn.id, nid, psi.nodes(nid).budget - r)
            delegated += ((nid, v))
          }
          extra += ((cid, nn.id, v, r))
        }

        // -- 3. one-hop extension of surviving rows -----------------------
        val extraDf = extra.toSeq.toDF("cid", "node", "v", "remaining")
        val extendable =
          cur.join(delegated.toSeq.toDF("node", "v"), Seq("node", "v"), "left_anti")
            // USING joins move the join columns first — restore the order
            // before the positional union.
            .select("cid", "node", "v", "remaining")
            .unionAll(extraDf)
        // New dominating nodes count their anchor as visited, so a cyclic
        // graph cannot re-enter them.
        seen = seen.unionAll(extraDf.select("node", "v"))
        val ext = extendable
          .join(broadcast(edges), extendable("v") === edges("src"))
          .select(col("cid"), col("node"), col("dst") as "v",
            (col("remaining") - 1) as "remaining")
          .distinct()
          .join(broadcast(md), col("cid") === col("mcid") && col("v") === col("mv"))
          .join(maxOpp, Seq("cid"))
          .where(col("md") <= col("remaining") + col("maxOpp"))
          .join(seen, Seq("node", "v"), "left_anti")
          .select("cid", "node", "v", "remaining")
          .localCheckpoint()
        // seen/frontier stay flat unions of checkpointed level outputs.
        seen = seen.unionAll(ext.select("node", "v"))
        frontier = frontier.where(col("remaining") =!= r).unionAll(ext)
      }
    }
    psis
  }

  /** Single-cluster convenience wrapper (used by unit tests). */
  def detect(spark: SparkSession, edges: DataFrame, cluster: Seq[DirQuery],
             minDistToGoals: DataFrame, maxOppositeBudget: Int,
             ids: AtomicLong): SharingGraph = {
    val md = minDistToGoals.select(lit(0) as "cid", col("v"), col("md"))
    detectAll(spark, edges, Seq(ClusterInput(0, cluster, maxOppositeBudget)), md, ids)(0)
  }
}
