package repro.core

import org.apache.spark.sql.functions._

/** Query clustering — Phase 1 of the common sub-structure detection
  * (Definitions 4.4–4.6 and Algorithm 2).
  *
  * Γ(q)/Γ_r(q) (hop-constrained neighbors) are read off the already-built
  * distance index — the paper explicitly reuses the index construction
  * traversal for this. Pairwise similarity and the hierarchical clustering
  * itself run on the driver: with |Q| ≤ a few hundred and reach sets
  * bounded by the k-hop ball, this is exactly the "medium size" regime the
  * paper gives for choosing hierarchical clustering.
  */
object Cluster {

  /** Γ sets per query from the shared index (`root` = endpoint vertex). */
  def gammaSets(index: DistIndex, queries: Seq[PathQuery])
      : (Map[Int, Set[Long]], Map[Int, Set[Long]]) = {
    def sets(df: org.apache.spark.sql.DataFrame, key: PathQuery => Long) = {
      val byRoot = df.select(col("root"), col("v"), col("dist")).collect()
        .groupBy(_.getLong(0))
      queries.map { q =>
        val rows = byRoot.getOrElse(key(q), Array.empty)
        q.qid -> rows.iterator.filter(_.getInt(2) <= q.k).map(_.getLong(1)).toSet
      }.toMap
    }
    (sets(index.fwd, _.s), sets(index.bwd, _.t))
  }

  /** HC-s-t path query similarity μ (Def. 4.5): the harmonic mean of the
    * two overlap ratios `|Γ∩| / min(|ΓA|,|ΓB|)`.
    *
    * Zero-intersection handling: either side empty → μ = 0. The paper's
    * footnote literally sets the infinite `min/|∩|` term to 0 (which would
    * let μ exceed 1, violating its own property (1)); its worked numbers —
    * δ({q0,q1,q2},{q3,q4}) = 0.64 in Example 4.1 — are only reproducible
    * with the μ = 0 reading, so we follow the example (DESIGN.md §7).
    */
  def mu(gA: Set[Long], gB: Set[Long], grA: Set[Long], grB: Set[Long]): Double = {
    val if_ = (gA & gB).size
    val ib = (grA & grB).size
    if (if_ == 0 || ib == 0) 0.0
    else {
      val x = math.min(gA.size, gB.size).toDouble / if_
      val y = math.min(grA.size, grB.size).toDouble / ib
      math.min(1.0, 2.0 / (x + y))
    }
  }

  /** Pairwise similarity matrix over the batch. */
  def similarityMatrix(index: DistIndex, queries: Seq[PathQuery]): Map[(Int, Int), Double] = {
    val (g, gr) = gammaSets(index, queries)
    (for {
      a <- queries; b <- queries if a.qid < b.qid
    } yield (a.qid, b.qid) -> mu(g(a.qid), g(b.qid), gr(a.qid), gr(b.qid))).toMap
  }

  /** Mean pairwise similarity of the whole batch (the μ_Q of Exp-1). */
  def batchSimilarity(index: DistIndex, queries: Seq[PathQuery]): Double = {
    if (queries.size < 2) return 0.0
    val m = similarityMatrix(index, queries)
    m.values.sum / m.size
  }

  /** Algorithm 2 (`ClusterQuery`): greedy agglomerative merging of the two
    * most similar groups under group-average linkage (Def. 4.6) until no
    * pair exceeds γ.
    */
  def clusterQueries(queries: Seq[PathQuery], sim: Map[(Int, Int), Double],
                     gamma: Double): Vector[Vector[PathQuery]] = {
    def muOf(a: Int, b: Int): Double =
      if (a == b) 1.0 else sim.getOrElse(if (a < b) (a, b) else (b, a), 0.0)
    var cs: Vector[Vector[PathQuery]] = queries.map(Vector(_)).toVector
    var changed = true
    while (changed && cs.size > 1) {
      changed = false
      var best = 0.0; var bi = -1; var bj = -1
      for (i <- cs.indices; j <- (i + 1) until cs.size) {
        val d = (for { a <- cs(i); b <- cs(j) } yield muOf(a.qid, b.qid)).sum /
          (cs(i).size.toDouble * cs(j).size)
        if (d > best) { best = d; bi = i; bj = j }
      }
      if (best > gamma) {
        cs = cs.zipWithIndex.collect { case (c, idx) if idx != bi && idx != bj => c } :+
          (cs(bi) ++ cs(bj))
        changed = true
      }
    }
    cs
  }
}
