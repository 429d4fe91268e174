package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Level-synchronous hop-constrained path search — the dataflow rendition of
  * the recursive `Search` procedure of Algorithms 1 and 4.
  *
  * A *search node* is an HC-s path query `q_{v,b}` (Def. 4.2): enumerate all
  * simple paths starting at `vertex` with at most `budget` hops. All nodes
  * run in one dataflow, keyed by `node`; a path row is
  * `(node, path: array<bigint>, last, len)` and every prefix is a result
  * (the paper's `Search` adds `p` to `P` before recursing).
  *
  * Computation sharing (Alg. 4 lines 22–23) is expressed through `stitches`:
  * when a node's frontier extends onto a vertex owned by one of its
  * dominating HC-s path queries, the row stops searching and instead joins
  * the child's results. Instead of processing Ψ in explicit topological
  * order (Alg. 4 line 6) — which would serialize one Spark loop per Ψ level
  * — we exploit that a stitch always consumes ≥ 1 hop: paths of total
  * length `L` only ever need child paths of length `< L`, so a single
  * length-synchronized loop computes every node's paths together:
  *
  *   round L:  P_L(n) = direct one-hop extensions of n's live frontier
  *                    ∪ { prefix(d hops, ending on stitch vertex) ++
  *                        childPath(L-d hops) : stitch prefixes pooled in
  *                        earlier rounds, child paths from earlier rounds }
  *
  * This yields exactly the topological-order result (each stitched path has
  * a unique first-stitch decomposition) in `maxBudget` rounds regardless of
  * Ψ's depth.
  */
object Enumerator {

  /** One HC-s path query to run: enumerate from `vertex` with `budget` hops. */
  final case class NodeStart(node: Long, vertex: Long, budget: Int)

  /** `parent` reuses `child`'s results whenever its search extends onto
    * `vertex` (= the child's anchor vertex).
    */
  final case class Stitch(parent: Long, vertex: Long, child: Long)

  /** Run all `starts` to completion.
    *
    * @param edges   `(src, dst)`; pass the reverse graph for backward nodes
    * @param starts  the search nodes (all Ψ HC-s path queries of one
    *                direction, or one node per query for the baselines)
    * @param allowed optional pruning table `(node, v, maxDepth)`: an
    *                extension of `node` onto `v` at depth `d` survives only
    *                if `d <= maxDepth` (vertices absent from the table are
    *                pruned — distance infinity, Section III)
    * @param stitches domination edges; every `child` must also be in `starts`
    * @return `(node, path, last, len)` — all simple hop-bounded paths per
    *         node, including the trivial zero-length path; stitched rows may
    *         be non-simple across the stitch point (the paper filters
    *         duplicates only at final concatenation, Alg. 4 line 13)
    */
  def enumerate(
      spark: SparkSession,
      edges: DataFrame,
      starts: Seq[NodeStart],
      allowed: Option[DataFrame],
      stitches: Seq[Stitch] = Nil,
  ): DataFrame = {
    import spark.implicits._
    require(starts.nonEmpty, "no search nodes")
    val startIds = starts.map(_.node).toSet
    require(stitches.forall(s => startIds(s.child) && startIds(s.parent)),
      "stitch endpoints must be search nodes")

    val budgets = broadcast(starts.map(s => (s.node, s.budget)).toDF("node", "budget"))
    val maxBudget = starts.map(_.budget).max

    val init = starts
      .map(s => (s.node, Array(s.vertex), s.vertex, 0))
      .toDF("node", "path", "last", "len")
      .localCheckpoint()

    var frontier = init
    val acc = scala.collection.mutable.ArrayBuffer[DataFrame](init)
    val pendingPieces = scala.collection.mutable.ArrayBuffer[DataFrame]()

    val stitchDf =
      if (stitches.isEmpty) None
      else Some(broadcast(stitches.map(s => (s.parent, s.vertex, s.child))
        .toDF("node", "sv", "child")))

    // ---- phase 1: direct search, one round per hop ----------------------
    var round = 0
    while (round < maxBudget && !frontier.isEmpty) {
      round += 1
      // One hop: frontier x edges, simple-path check, budget check, pruning.
      // Edge and pruning tables are broadcast — bench-scale graphs fit, and
      // the frontier (the big side) then never shuffles inside the loop.
      var ext = frontier
        .join(broadcast(edges), frontier("last") === edges("src"))
        .where(!array_contains(col("path"), col("dst")))
        .select(col("node"), col("path"), col("dst"), col("len") + 1 as "len")
        .join(budgets, Seq("node"))
        .where(col("len") <= col("budget"))
        .drop("budget")
      for (a <- allowed) {
        val al = a.select(col("node") as "anode", col("v") as "av", col("maxDepth"))
        ext = ext
          .join(broadcast(al), ext("node") === al("anode") && ext("dst") === al("av"))
          .where(col("len") <= col("maxDepth"))
          .select(col("node"), col("path"), col("dst"), col("len"))
      }

      frontier = stitchDf match {
        case None =>
          ext.select(col("node"), concat(col("path"), array(col("dst"))) as "path",
            col("dst") as "last", col("len"))
            .localCheckpoint()
        case Some(st) =>
          // Rows landing on a stitch vertex become pending prefixes (their
          // suffixes are delegated); `path` excludes the stitch vertex —
          // the child's paths start with it.
          pendingPieces += ext
            .join(st, ext("node") === st("node") && ext("dst") === st("sv"))
            .select(ext("node") as "node", col("path"), col("len"), col("child"))
            .localCheckpoint()
          ext.join(st, ext("node") === st("node") && ext("dst") === st("sv"), "left_anti")
            .select(col("node"), concat(col("path"), array(col("dst"))) as "path",
              col("dst") as "last", col("len"))
            .localCheckpoint()
      }
      acc += frontier
    }

    // ---- phase 2: stitch resolution --------------------------------------
    // Each stitch consumes at least one hop, so stitch chains nest at most
    // `maxBudget` deep — a fixpoint over "newest pieces" terminates in a few
    // iterations regardless of Ψ's topological depth, and every stitched
    // path is produced exactly once (unique first-stitch decomposition).
    if (pendingPieces.nonEmpty) {
      val pendingAll = pendingPieces.reduce(_ unionAll _)
      var newest = acc.reduce(_ unionAll _)
      var iter = 0
      var done = false
      while (iter < maxBudget && !done) {
        iter += 1
        val c = newest.select(col("node") as "cnode", col("path") as "cpath",
          col("last") as "clast", col("len") as "clen")
        val stitched = pendingAll
          .join(c, pendingAll("child") === c("cnode"))
          .join(budgets, Seq("node"))
          .where(col("len") + col("clen") <= col("budget"))
          .select(col("node"), concat(col("path"), col("cpath")) as "path",
            col("clast") as "last", col("len") + col("clen") as "len")
          .localCheckpoint()
        if (stitched.isEmpty) done = true
        else { acc += stitched; newest = stitched }
      }
    }
    acc.reduce(_ unionAll _)
  }
}
