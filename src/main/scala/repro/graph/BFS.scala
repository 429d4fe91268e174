package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Multi-source BFS over an edge DataFrame (the paper's index construction
  * primitive, Alg. 1/4 lines 1–2, following the multi-source BFS of [36]).
  *
  * Runs one level-synchronous frontier expansion for *all* roots at once;
  * the per-root visited set is the accumulated `(root, v)` distance table,
  * so work shared between roots is shared by the dataflow (each reached
  * `(root, v)` pair is expanded exactly once).
  */
object BFS {

  /** Compute hop distances from every root.
    *
    * @param edges   `(src, dst)` edge table
    * @param roots   `(root, v)` — BFS identity and its start vertex; several
    *                roots may share a start vertex (per-query mode) or the
    *                root may equal the vertex (shared-index mode)
    * @param maxHops inclusive distance cap (distances beyond it are treated
    *                as infinity by downstream pruning, as in Section III)
    * @return `(root, v, dist)` with `0 <= dist <= maxHops`
    */
  def multiSource(edges: DataFrame, roots: DataFrame, maxHops: Int): DataFrame = {
    require(maxHops >= 0, s"maxHops=$maxHops")
    // The edge table is broadcast: the repro targets bench-scale graphs on
    // local[*], where a map-side join per level beats shuffling the frontier
    // (and is the design the paper's multi-source BFS [36] amortizes too).
    var frontier = roots.select(col("root"), col("v"), lit(0) as "dist")
      .distinct().localCheckpoint()
    // `dist` stays a flat union of checkpointed level results — no
    // re-materialization of the accumulated table per level.
    var dist = frontier
    var hop = 0
    while (hop < maxHops && !frontier.isEmpty) {
      hop += 1
      val next = frontier
        .join(broadcast(edges), frontier("v") === edges("src"))
        .select(col("root"), col("dst") as "v", lit(hop) as "dist")
        .distinct()
        .join(dist, Seq("root", "v"), "left_anti")
        .select("root", "v", "dist")
        .localCheckpoint()
      dist = dist.unionAll(next)
      frontier = next
    }
    dist
  }
}
