package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.graph.GraphOps

/** Algorithm 1 (`BasicEnum`) and its variants:
  *
  *  - `PathEnum` mode (`perQueryIndex = true`): the state-of-the-art
  *    single-query algorithm [15] run once per query — the index is built
  *    per query, so endpoint overlap between queries is *not* shared.
  *  - `BasicEnum` (`optimized = false`): shared multi-source-BFS index,
  *    fixed `⌈k/2⌉ / ⌊k/2⌋` bidirectional split.
  *  - `BasicEnum+` (`optimized = true`): shared index plus the cost-based
  *    search-order optimization — the forward/backward budget split is
  *    chosen per query from index-derived frontier cardinalities.
  *
  * No computation is shared *between* queries beyond the index (that is
  * BatchEnum's contribution); each query's search runs keyed by its qid, so
  * the row counts processed equal the sum of the per-query searches.
  */
object BasicEnum {

  /** Pick the forward budget `a` minimizing the estimated bidirectional
    * cost `f(a)·b(k-a) + f(a) + b(k-a)` over cumulative frontier sizes
    * (the "optimized search order" of BasicEnum+/BatchEnum+).
    */
  def bestSplit(q: PathQuery, fCum: Map[Long, Array[Long]],
                bCum: Map[Long, Array[Long]], fKey: Long, bKey: Long): Int = {
    val f = fCum.getOrElse(fKey, Array.fill(q.k + 1)(1L))
    val b = bCum.getOrElse(bKey, Array.fill(q.k + 1)(1L))
    (1 to q.k).minBy { a =>
      val fa = f(math.min(a, f.length - 1))
      val bb = b(math.min(q.k - a, b.length - 1))
      fa * bb + fa + bb
    }
  }

  def splitsFor(queries: Seq[PathQuery], index: DistIndex, optimized: Boolean,
                perQueryIndex: Boolean): Seq[Concat.Split] =
    if (!optimized) {
      queries.map(q => Concat.Split(q.qid, q.s, q.t, q.k, q.fwdBudget))
    } else {
      val fCum = index.frontierSizes(index.fwd)
      val bCum = index.frontierSizes(index.bwd)
      queries.map { q =>
        val (fk, bk) = if (perQueryIndex) (q.qid.toLong, q.qid.toLong) else (q.s, q.t)
        Concat.Split(q.qid, q.s, q.t, q.k, bestSplit(q, fCum, bCum, fk, bk))
      }
    }

  /** Pruning tables for per-query searches keyed by qid.
    * Forward: `maxDepth(v) = k - dist_{G_r}(t, v)` (Lemma 3.1); backward
    * symmetric with `dist_G(s, v)`.
    */
  def allowedTables(spark: SparkSession, queries: Seq[PathQuery], index: DistIndex,
                    perQueryIndex: Boolean): (DataFrame, DataFrame) = {
    import spark.implicits._
    val qdf = broadcast(queries.map(q => (q.qid.toLong, q.s, q.t, q.k))
      .toDF("qid", "s", "t", "k"))
    def tbl(dists: DataFrame, joinKey: String): DataFrame = {
      val d = dists.select(col("root"), col("v"), col("dist"))
      val keyed =
        if (perQueryIndex) qdf.join(d, qdf("qid") === d("root"))
        else qdf.join(d, qdf(joinKey) === d("root"))
      keyed.select(col("qid") as "node", col("v"), (col("k") - col("dist")) as "maxDepth")
        .where(col("maxDepth") >= 0)
    }
    (tbl(index.bwd, "t"), (tbl(index.fwd, "s")))
  }

  /** Run the whole batch; returns `(qid, path)` HC-s-t simple paths. */
  def run(spark: SparkSession, edges: DataFrame, queries: Seq[PathQuery],
          optimized: Boolean = false, perQueryIndex: Boolean = false): DataFrame = {
    require(queries.map(_.qid).distinct.size == queries.size, "duplicate qids")
    val index =
      (if (perQueryIndex) DistIndex.perQuery(spark, edges, queries)
       else DistIndex.shared(spark, edges, queries)).persist()
    try {
      val splits = splitsFor(queries, index, optimized, perQueryIndex)
      val (allowedFwd0, allowedBwd0) = allowedTables(spark, queries, index, perQueryIndex)
      // Materialize once — these are broadcast-joined at every search level.
      val allowedFwd = allowedFwd0.localCheckpoint()
      val allowedBwd = allowedBwd0.localCheckpoint()
      val aOf = splits.map(s => s.qid -> s.a).toMap
      val fwd = Enumerator.enumerate(spark, edges,
        queries.map(q => Enumerator.NodeStart(q.qid.toLong, q.s, aOf(q.qid))),
        Some(allowedFwd)).withColumnRenamed("node", "qid")
      val bwd = Enumerator.enumerate(spark, GraphOps.reverse(edges),
        queries.map(q => Enumerator.NodeStart(q.qid.toLong, q.t, q.k - aOf(q.qid))),
        Some(allowedBwd)).withColumnRenamed("node", "qid")
      Concat.assemble(spark, fwd, bwd, splits).localCheckpoint()
    } finally index.unpersist()
  }
}
