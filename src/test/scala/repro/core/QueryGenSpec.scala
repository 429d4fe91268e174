package repro.core

import repro.{SparkSpec, TestRef}
import repro.graph.GraphGen

class QueryGenSpec extends SparkSpec {

  private lazy val gen = QueryGen.fromEdges(GraphGen.paperExampleEdges, seed = 42)

  test("random queries are reachable within their hop constraint") {
    val qs = gen.randomBatch(20, kMin = 2, kMax = 5)
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    for (q <- qs) {
      val d = TestRef.bfs(adj, q.s, q.k)
      assert(d.contains(q.t) && d(q.t) <= q.k && q.s != q.t, s"$q unreachable")
    }
  }

  test("random queries use distinct qids and hop constraints in range") {
    val qs = gen.randomBatch(25, kMin = 3, kMax = 6)
    assert(qs.map(_.qid).distinct.size == qs.size)
    assert(qs.forall(q => q.k >= 3 && q.k <= 6))
  }

  test("generation is deterministic in seed") {
    val a = QueryGen.fromEdges(GraphGen.paperExampleEdges, 7).randomBatch(10)
    val b = QueryGen.fromEdges(GraphGen.paperExampleEdges, 7).randomBatch(10)
    assert(a == b)
  }

  test("similarity 1.0 yields a single pivot family (one source vertex)") {
    val qs = gen.similarBatch(16, similarity = 1.0, kMin = 3, kMax = 5)
    assert(qs.nonEmpty)
    assert(qs.map(_.s).distinct.size == 1)
  }

  test("similarity 0.0 yields independent queries (many sources)") {
    val g = QueryGen.fromEdges(TestRef.randomEdges(200, 900, 5), seed = 11)
    val qs = g.similarBatch(24, similarity = 0.0, kMin = 3, kMax = 5)
    assert(qs.map(_.s).distinct.size > 10, s"only ${qs.map(_.s).distinct.size} sources")
  }

  test("similar batches remain valid reachable queries") {
    val es = TestRef.randomEdges(100, 500, 6)
    val g = QueryGen.fromEdges(es, seed = 12)
    val adj = TestRef.adjacency(es)
    for (sim <- Seq(0.0, 0.5, 0.9); q <- g.similarBatch(12, sim))
      assert(TestRef.bfs(adj, q.s, q.k).contains(q.t), s"sim=$sim $q")
  }

  test("measured batch similarity rises with the similarity dial") {
    val edges = GraphGen.powerLaw(spark, 400, 2400, seed = 21)
    val g = QueryGen(edges, seed = 13)
    def measured(sim: Double): Double = {
      val qs = g.similarBatch(16, sim).zipWithIndex.map { case (q, i) => q.copy(qid = i) }
      val idx = DistIndex.shared(spark, edges, qs).persist()
      try Cluster.batchSimilarity(idx, qs) finally idx.unpersist()
    }
    val lo = measured(0.0); val hi = measured(0.95)
    assert(hi > lo, s"similarity dial not monotone: lo=$lo hi=$hi")
    assert(hi > 0.5, s"high-similarity batch only reached mu_Q=$hi")
  }
}
