package repro.graph

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestRef}

class BFSSpec extends SparkSpec {
  import spark.implicits._

  private def distMap(df: org.apache.spark.sql.DataFrame): Map[(Long, Long), Int] =
    df.collect().map(r => (r.getLong(0), r.getLong(1)) -> r.getInt(2)).toMap

  test("single-source BFS on the paper example matches reference") {
    val edges = GraphGen.paperExample(spark)
    val roots = Seq((0L, 0L)).toDF("root", "v")
    val got = distMap(BFS.multiSource(edges, roots, 5))
    val ref = TestRef.bfs(TestRef.adjacency(GraphGen.paperExampleEdges), 0L, 5)
    assert(got == ref.map { case (v, d) => (0L, v) -> d })
  }

  test("multi-source BFS computes per-root distances independently") {
    val edges = GraphGen.paperExample(spark)
    val roots = Seq((0L, 0L), (2L, 2L), (9L, 9L)).toDF("root", "v")
    val got = distMap(BFS.multiSource(edges, roots, 4))
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    for (r <- Seq(0L, 2L, 9L)) {
      val ref = TestRef.bfs(adj, r, 4)
      assert(got.filter(_._1._1 == r) == ref.map { case (v, d) => (r, v) -> d },
        s"root $r mismatch")
    }
  }

  test("maxHops caps the explored radius") {
    val edges = GraphGen.paperExample(spark)
    val roots = Seq((0L, 0L)).toDF("root", "v")
    val got = distMap(BFS.multiSource(edges, roots, 2))
    assert(got.values.max <= 2)
    val ref = TestRef.bfs(TestRef.adjacency(GraphGen.paperExampleEdges), 0L, 2)
    assert(got == ref.map { case (v, d) => (0L, v) -> d })
  }

  test("maxHops = 0 returns just the roots") {
    val edges = GraphGen.paperExample(spark)
    val roots = Seq((5L, 5L), (7L, 7L)).toDF("root", "v")
    val got = distMap(BFS.multiSource(edges, roots, 0))
    assert(got == Map((5L, 5L) -> 0, (7L, 7L) -> 0))
  }

  test("two roots starting at the same vertex both get full results") {
    val edges = GraphGen.paperExample(spark)
    val roots = Seq((100L, 0L), (200L, 0L)).toDF("root", "v")
    val got = distMap(BFS.multiSource(edges, roots, 3))
    val ref = TestRef.bfs(TestRef.adjacency(GraphGen.paperExampleEdges), 0L, 3)
    assert(got.filter(_._1._1 == 100L).map { case ((_, v), d) => v -> d } == ref)
    assert(got.filter(_._1._1 == 200L).map { case ((_, v), d) => v -> d } == ref)
  }

  for (seed <- 1 to 8) {
    test(s"random graph BFS matches reference (seed=$seed)") {
      val es = TestRef.randomEdges(n = 40, m = 150, seed = seed)
      val edges = es.toDF("src", "dst")
      val adj = TestRef.adjacency(es)
      val rnd = new scala.util.Random(seed)
      val srcs = Seq.fill(3)(rnd.nextInt(40).toLong).distinct
      val roots = srcs.map(v => (v, v)).toDF("root", "v")
      val got = distMap(BFS.multiSource(edges, roots, 5))
      val ref = (for { s <- srcs; (v, d) <- TestRef.bfs(adj, s, 5) } yield (s, v) -> d).toMap
      assert(got == ref)
    }
  }

  test("disconnected vertices never appear in the distance table") {
    val edges = Seq((1L, 2L), (3L, 4L)).toDF("src", "dst")
    val got = distMap(BFS.multiSource(edges, Seq((1L, 1L)).toDF("root", "v"), 5))
    assert(got.keySet.map(_._2) == Set(1L, 2L))
  }
}
