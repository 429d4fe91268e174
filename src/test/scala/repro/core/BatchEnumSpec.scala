package repro.core

import org.apache.spark.sql.DataFrame
import repro.{SparkSpec, TestRef}
import repro.graph.GraphGen

/** End-to-end equivalence of BatchEnum/BatchEnum+ with BasicEnum, the
  * driver DFS reference, and the DuckDB oracle — the correctness heart of
  * the reproduction: the sharing machinery must never change results.
  */
class BatchEnumSpec extends SparkSpec {
  import spark.implicits._

  private def asSets(df: DataFrame): Map[Long, Set[List[Long]]] =
    df.collect()
      .map(r => (r.getLong(0), r.getSeq[Long](1).toList))
      .groupBy(_._1).map { case (q, rs) => q -> rs.map(_._2).toSet }
      .withDefaultValue(Set.empty)

  private val paperQueries = Seq(
    PathQuery(0, 0L, 11L, 5),
    PathQuery(1, 2L, 13L, 5),
    PathQuery(2, 5L, 12L, 5),
    PathQuery(3, 4L, 14L, 4),
    PathQuery(4, 9L, 14L, 3),
  )

  test("paper example: BatchEnum equals the DFS reference for all queries") {
    val edges = GraphGen.paperExample(spark)
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    val res = asSets(BatchEnum.run(spark, edges, paperQueries, gamma = 0.8).paths)
    for (q <- paperQueries)
      assert(res(q.qid.toLong) == TestRef.hcstPaths(adj, q.s, q.t, q.k), s"q${q.qid}")
  }

  test("paper example: BatchEnum matches the DuckDB oracle") {
    val edges = GraphGen.paperExample(spark)
    val r = BatchEnum.run(spark, edges, paperQueries, gamma = 0.8)
    PathOracle.check(spark, edges, paperQueries, r.paths)
  }

  test("paper example: sharing is actually detected (Ψ has dominating edges)") {
    val edges = GraphGen.paperExample(spark)
    val r = BatchEnum.run(spark, edges, paperQueries, gamma = 0.8)
    assert(r.clusters.map(_.map(_.qid).toSet).toSet == Set(Set(0, 1, 2), Set(3, 4)))
    assert(r.psiEdges > 0, "expected dominating HC-s path queries in Ψ")
  }

  test("paper example: BatchEnum+ (optimized order) equals BatchEnum") {
    val edges = GraphGen.paperExample(spark)
    val a = asSets(BatchEnum.run(spark, edges, paperQueries, gamma = 0.8).paths)
    val b = asSets(BatchEnum.run(spark, edges, paperQueries, gamma = 0.8,
      optimized = true).paths)
    assert(a == b)
  }

  test("gamma sweep never changes results, only the sharing structure") {
    val edges = GraphGen.paperExample(spark)
    val ref = asSets(BasicEnum.run(spark, edges, paperQueries))
    for (g <- Seq(0.1, 0.5, 0.9, 1.0))
      assert(asSets(BatchEnum.run(spark, edges, paperQueries, gamma = g).paths) == ref,
        s"gamma=$g")
  }

  test("phase timings are populated") {
    val edges = GraphGen.paperExample(spark)
    val t = BatchEnum.run(spark, edges, paperQueries).timings
    assert(t.buildIndexMs >= 0 && t.enumerationMs >= 0 && t.totalMs > 0)
  }

  test("duplicate-free results") {
    val edges = GraphGen.paperExample(spark)
    val res = BatchEnum.run(spark, edges, paperQueries, gamma = 0.5).paths
    assert(res.count() == res.distinct().count())
  }

  test("identical queries in a batch all receive the full result set") {
    val edges = GraphGen.paperExample(spark)
    val qs = Seq(PathQuery(0, 0L, 11L, 5), PathQuery(1, 0L, 11L, 5),
      PathQuery(2, 0L, 11L, 3))
    val res = asSets(BatchEnum.run(spark, edges, qs, gamma = 0.5).paths)
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    assert(res(0L) == TestRef.hcstPaths(adj, 0L, 11L, 5))
    assert(res(1L) == res(0L))
    assert(res(2L) == TestRef.hcstPaths(adj, 0L, 11L, 3))
  }

  test("cyclic graph: sharing across overlapping cycles stays simple-path-correct") {
    val edges = Seq((0L, 1L), (1L, 2L), (2L, 0L), (2L, 3L), (3L, 1L), (1L, 3L),
      (3L, 4L), (4L, 2L)).toDF("src", "dst")
    val esSeq = Seq((0L, 1L), (1L, 2L), (2L, 0L), (2L, 3L), (3L, 1L), (1L, 3L),
      (3L, 4L), (4L, 2L))
    val adj = TestRef.adjacency(esSeq)
    val qs = Seq(PathQuery(0, 0L, 4L, 6), PathQuery(1, 1L, 4L, 6), PathQuery(2, 2L, 4L, 5))
    val res = asSets(BatchEnum.run(spark, edges, qs, gamma = 0.1).paths)
    for (q <- qs)
      assert(res(q.qid.toLong) == TestRef.hcstPaths(adj, q.s, q.t, q.k), s"q${q.qid}")
  }

  for (seed <- 1 to 12) {
    test(s"random graph: BatchEnum == BasicEnum == reference (seed=$seed)") {
      val es = TestRef.randomEdges(n = 24, m = 80, seed = 300 + seed)
      val edges = es.toDF("src", "dst")
      val adj = TestRef.adjacency(es)
      val rnd = new scala.util.Random(seed)
      // bias towards overlapping endpoints so sharing paths are exercised
      val pivots = Vector.fill(3)(rnd.nextInt(24).toLong)
      val qs = (0 until 6).flatMap { i =>
        val s = if (rnd.nextBoolean()) pivots(rnd.nextInt(3)) else rnd.nextInt(24).toLong
        val reach = TestRef.bfs(adj, s, 5).keySet - s
        if (reach.isEmpty) None
        else Some(PathQuery(i, s, reach.toVector(rnd.nextInt(reach.size)), 3 + rnd.nextInt(3)))
      }.groupBy(q => (q.s, q.t, q.k)).values.map(_.head).toSeq // dedupe exact dups, keep qids unique
        .zipWithIndex.map { case (q, i) => q.copy(qid = i) }
      if (qs.nonEmpty) {
        val gamma = Seq(0.1, 0.5, 0.9)(seed % 3)
        val opt = seed % 2 == 0
        val got = asSets(BatchEnum.run(spark, edges, qs, gamma, opt).paths)
        for (q <- qs)
          assert(got(q.qid.toLong) == TestRef.hcstPaths(adj, q.s, q.t, q.k),
            s"q${q.qid}(${q.s},${q.t},${q.k}) gamma=$gamma opt=$opt")
        if (seed <= 4) PathOracle.check(spark, edges, qs,
          BatchEnum.run(spark, edges, qs, gamma, opt).paths)
      }
    }
  }
}
