package repro.core

import org.apache.spark.sql.DataFrame
import repro.{SparkSpec, TestRef}
import repro.graph.GraphGen

/** The search engine in isolation: HC-s path semantics (Def. 4.2), pruning
  * soundness, and the stitch mechanics of Alg. 4 lines 22–23.
  */
class EnumeratorSpec extends SparkSpec {
  import spark.implicits._

  private def pathsOf(df: DataFrame, node: Long): Set[List[Long]] =
    df.where(s"node = $node").collect().map(_.getSeq[Long](1).toList).toSet

  test("single node enumerates exactly the simple hop-bounded paths") {
    val edges = GraphGen.paperExample(spark)
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 0L, 3)), None)
    val ref = TestRef.hcsPaths(TestRef.adjacency(GraphGen.paperExampleEdges), 0L, 3)
    assert(pathsOf(res, 0) == ref)
  }

  test("budget 0 yields only the trivial path") {
    val edges = GraphGen.paperExample(spark)
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 4L, 0)), None)
    assert(pathsOf(res, 0) == Set(List(4L)))
  }

  test("several nodes run in one dataflow without crosstalk") {
    val edges = GraphGen.paperExample(spark)
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 0L, 2), Enumerator.NodeStart(1, 2L, 3),
        Enumerator.NodeStart(2, 9L, 1)), None)
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    assert(pathsOf(res, 0) == TestRef.hcsPaths(adj, 0L, 2))
    assert(pathsOf(res, 1) == TestRef.hcsPaths(adj, 2L, 3))
    assert(pathsOf(res, 2) == TestRef.hcsPaths(adj, 9L, 1))
  }

  test("pruning drops exactly the extensions past maxDepth") {
    val edges = GraphGen.paperExample(spark)
    // Allow only v4 at depth 1 and v9 at depth 2 — the search must be
    // confined to the v0→v4→v9 spine.
    val allowed = Seq((0L, 4L, 1), (0L, 9L, 2)).toDF("node", "v", "maxDepth")
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 0L, 3)), Some(allowed))
    assert(pathsOf(res, 0) == Set(List(0L), List(0L, 4L), List(0L, 4L, 9L)))
  }

  test("vertices absent from the pruning table are unreachable (dist = ∞)") {
    val edges = GraphGen.paperExample(spark)
    val allowed = Seq((0L, 1L, 5)).toDF("node", "v", "maxDepth")
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 0L, 3)), Some(allowed))
    assert(pathsOf(res, 0) == Set(List(0L), List(0L, 1L)))
  }

  test("stitch completes rows from the child's results instead of searching") {
    val edges = GraphGen.paperExample(spark)
    // child node 10 = q_{v4,2}; parent node 0 = q_{v0,3} stitching at v4.
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 0L, 3), Enumerator.NodeStart(10, 4L, 2)), None,
      stitches = Seq(Enumerator.Stitch(0, 4L, 10)))
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    // Same path sets as direct searches: stitching must be transparent.
    assert(pathsOf(res, 0) == TestRef.hcsPaths(adj, 0L, 3))
    assert(pathsOf(res, 10) == TestRef.hcsPaths(adj, 4L, 2))
  }

  test("stitch honors the parent's remaining budget (length filter)") {
    val edges = GraphGen.paperExample(spark)
    // child has budget 3 but the parent reaching v4 at depth 1 with budget 2
    // may only take 1 more hop from the child's results.
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 0L, 2), Enumerator.NodeStart(10, 4L, 3)), None,
      stitches = Seq(Enumerator.Stitch(0, 4L, 10)))
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    assert(pathsOf(res, 0) == TestRef.hcsPaths(adj, 0L, 2))
  }

  test("chained stitches resolve through intermediate nodes") {
    // 0→1→2→3→4 plus branches; grandparent stitches parent stitches child.
    val edges = Seq((0L, 1L), (1L, 2L), (2L, 3L), (3L, 4L), (2L, 5L)).toDF("src", "dst")
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 0L, 4), Enumerator.NodeStart(1, 1L, 3),
        Enumerator.NodeStart(2, 2L, 2)), None,
      stitches = Seq(Enumerator.Stitch(0, 1L, 1), Enumerator.Stitch(1, 2L, 2)))
    val adj = TestRef.adjacency(Seq((0L, 1L), (1L, 2L), (2L, 3L), (3L, 4L), (2L, 5L)))
    assert(pathsOf(res, 0) == TestRef.hcsPaths(adj, 0L, 4))
    assert(pathsOf(res, 1) == TestRef.hcsPaths(adj, 1L, 3))
    assert(pathsOf(res, 2) == TestRef.hcsPaths(adj, 2L, 2))
  }

  test("stitched rows are not searched further (suffix fully delegated)") {
    // Line graph 0→1→2→3: child at v1 with budget 1 can only reach v2, so a
    // parent stitching at v1 must not see v3 even though its own budget
    // would reach it. (This asserts the mechanics; Detect never creates
    // such an under-budgeted edge.)
    val edges = Seq((0L, 1L), (1L, 2L), (2L, 3L)).toDF("src", "dst")
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 0L, 3), Enumerator.NodeStart(10, 1L, 1)), None,
      stitches = Seq(Enumerator.Stitch(0, 1L, 10)))
    assert(pathsOf(res, 0) == Set(List(0L), List(0L, 1L), List(0L, 1L, 2L)))
  }

  test("every result row carries consistent last/len columns") {
    val edges = GraphGen.paperExample(spark)
    val res = Enumerator.enumerate(spark, edges,
      Seq(Enumerator.NodeStart(0, 2L, 3)), None)
    for (r <- res.collect()) {
      val p = r.getSeq[Long](1)
      assert(r.getLong(2) == p.last, "last != path tail")
      assert(r.getInt(3) == p.size - 1, "len != hops")
    }
  }

  for (seed <- 1 to 5) {
    test(s"random graph HC-s paths match the reference (seed=$seed)") {
      val es = TestRef.randomEdges(n = 18, m = 45, seed = 500 + seed)
      val edges = es.toDF("src", "dst")
      val adj = TestRef.adjacency(es)
      val rnd = new scala.util.Random(seed)
      val starts = (0 until 3).map(i =>
        Enumerator.NodeStart(i.toLong, rnd.nextInt(18).toLong, 1 + rnd.nextInt(3)))
      val res = Enumerator.enumerate(spark, edges, starts, None)
      for (st <- starts)
        assert(pathsOf(res, st.node) == TestRef.hcsPaths(adj, st.vertex, st.budget),
          s"node ${st.node}")
    }
  }
}
