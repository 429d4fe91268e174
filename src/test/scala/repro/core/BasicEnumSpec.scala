package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestRef}
import repro.graph.GraphGen

/** PathEnum / BasicEnum / BasicEnum+ against the DuckDB oracle and the
  * driver-side DFS reference.
  */
class BasicEnumSpec extends SparkSpec {
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

  test("paper example: q0's result set matches Example 2.1 exactly") {
    val edges = GraphGen.paperExample(spark)
    val res = asSets(BasicEnum.run(spark, edges, Seq(paperQueries.head)))
    assert(res(0L) == Set(
      List(0L, 1L, 7L, 10L, 12L, 11L),
      List(0L, 4L, 9L, 3L, 6L, 11L),
      List(0L, 4L, 9L, 15L, 6L, 11L)))
  }

  test("paper example: q1 has the three analogous paths (Section IV-A)") {
    val edges = GraphGen.paperExample(spark)
    val res = asSets(BasicEnum.run(spark, edges, paperQueries))
    assert(res(1L) == Set(
      List(2L, 1L, 7L, 10L, 12L, 13L),
      List(2L, 4L, 9L, 3L, 6L, 13L),
      List(2L, 4L, 9L, 15L, 6L, 13L)))
  }

  test("paper example: all five queries match the DuckDB oracle") {
    val edges = GraphGen.paperExample(spark)
    PathOracle.check(spark, edges, paperQueries,
      BasicEnum.run(spark, edges, paperQueries))
  }

  test("paper example: all five queries match the driver DFS reference") {
    val edges = GraphGen.paperExample(spark)
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    val res = asSets(BasicEnum.run(spark, edges, paperQueries))
    for (q <- paperQueries)
      assert(res(q.qid.toLong) == TestRef.hcstPaths(adj, q.s, q.t, q.k),
        s"query ${q.qid} mismatch")
  }

  test("optimized search order (BasicEnum+) returns identical results") {
    val edges = GraphGen.paperExample(spark)
    val base = asSets(BasicEnum.run(spark, edges, paperQueries))
    val opt = asSets(BasicEnum.run(spark, edges, paperQueries, optimized = true))
    assert(base == opt)
  }

  test("PathEnum mode (per-query index) returns identical results") {
    val edges = GraphGen.paperExample(spark)
    val base = asSets(BasicEnum.run(spark, edges, paperQueries))
    val pe = asSets(BasicEnum.run(spark, edges, paperQueries, optimized = true,
      perQueryIndex = true))
    assert(base == pe)
  }

  test("k = 1 returns exactly the direct edges") {
    val edges = GraphGen.paperExample(spark)
    val qs = Seq(PathQuery(0, 0L, 1L, 1), PathQuery(1, 0L, 11L, 1))
    val res = asSets(BasicEnum.run(spark, edges, qs))
    assert(res(0L) == Set(List(0L, 1L)))
    assert(res(1L) == Set.empty[List[Long]])
  }

  test("unreachable target yields an empty result, not a failure") {
    val edges = GraphGen.paperExample(spark)
    val qs = Seq(PathQuery(0, 8L, 0L, 6)) // v8 has no out-edges
    assert(BasicEnum.run(spark, edges, qs).count() == 0)
  }

  test("duplicate-free: no path is emitted twice") {
    val edges = GraphGen.paperExample(spark)
    val res = BasicEnum.run(spark, edges, paperQueries)
    assert(res.count() == res.distinct().count())
  }

  test("cycles in the graph do not produce non-simple paths") {
    val edges = Seq((0L, 1L), (1L, 2L), (2L, 0L), (2L, 3L), (1L, 3L)).toDF("src", "dst")
    val qs = Seq(PathQuery(0, 0L, 3L, 6))
    val res = asSets(BasicEnum.run(spark, edges, qs))
    assert(res(0L) == Set(List(0L, 1L, 3L), List(0L, 1L, 2L, 3L)))
  }

  for (seed <- 1 to 10) {
    test(s"random graph: all three variants match the oracle (seed=$seed)") {
      val es = TestRef.randomEdges(n = 25, m = 70, seed = 100 + seed)
      val edges = es.toDF("src", "dst")
      val adj = TestRef.adjacency(es)
      val rnd = new scala.util.Random(seed)
      val qs = (0 until 4).flatMap { i =>
        val s = rnd.nextInt(25).toLong
        val reach = TestRef.bfs(adj, s, 5).keySet - s
        if (reach.isEmpty) None
        else {
          val t = reach.toVector(rnd.nextInt(reach.size))
          Some(PathQuery(i, s, t, 3 + rnd.nextInt(3)))
        }
      }
      if (qs.nonEmpty) {
        val ref = qs.map(q => q.qid.toLong -> TestRef.hcstPaths(adj, q.s, q.t, q.k)).toMap
        val basic = asSets(BasicEnum.run(spark, edges, qs))
        for (q <- qs) assert(basic(q.qid.toLong) == ref(q.qid.toLong), s"basic q${q.qid}")
        val opt = asSets(BasicEnum.run(spark, edges, qs, optimized = true))
        assert(opt == basic, "optimized != basic")
        if (seed <= 5) { // DuckDB CTE is the slow part; sample it
          PathOracle.check(spark, edges, qs, BasicEnum.run(spark, edges, qs))
          val pe = asSets(BasicEnum.run(spark, edges, qs, perQueryIndex = true))
          assert(pe == basic, "perQueryIndex != basic")
        }
      }
    }
  }
}
