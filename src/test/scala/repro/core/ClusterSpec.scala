package repro.core

import repro.SparkSpec
import repro.graph.GraphGen

class ClusterSpec extends SparkSpec {

  private val paperQueries = Seq(
    PathQuery(0, 0L, 11L, 5),
    PathQuery(1, 2L, 13L, 5),
    PathQuery(2, 5L, 12L, 5),
    PathQuery(3, 4L, 14L, 4),
    PathQuery(4, 9L, 14L, 3),
  )

  private lazy val paperIndex = {
    val edges = GraphGen.paperExample(spark)
    DistIndex.shared(spark, edges, paperQueries).persist()
  }

  test("mu: identical reach sets give similarity 1") {
    val g = Set(1L, 2L, 3L)
    assert(Cluster.mu(g, g, g, g) == 1.0)
  }

  test("mu: disjoint reach sets give similarity 0") {
    assert(Cluster.mu(Set(1L), Set(2L), Set(3L), Set(4L)) == 0.0)
  }

  test("mu: subset reach sets give similarity 1 (property 2 of Def. 4.5)") {
    val a = Set(1L, 2L); val b = Set(1L, 2L, 3L, 4L)
    assert(Cluster.mu(a, b, a, b) == 1.0)
  }

  test("mu is always within [0, 1]") {
    val rnd = new scala.util.Random(7)
    for (_ <- 1 to 200) {
      def rs() = (0 until rnd.nextInt(10)).map(_ => rnd.nextInt(12).toLong).toSet
      val m = Cluster.mu(rs(), rs(), rs(), rs())
      assert(m >= 0.0 && m <= 1.0, s"mu out of range: $m")
    }
  }

  test("mu is symmetric") {
    val rnd = new scala.util.Random(8)
    for (_ <- 1 to 100) {
      def rs() = (0 until (1 + rnd.nextInt(8))).map(_ => rnd.nextInt(10).toLong).toSet
      val (a, b, c, d) = (rs(), rs(), rs(), rs())
      assert(Cluster.mu(a, b, c, d) == Cluster.mu(b, a, d, c))
    }
  }

  test("paper example: mu(q3, q4) = 1 (Example 4.1)") {
    val (g, gr) = Cluster.gammaSets(paperIndex, paperQueries)
    assert(Cluster.mu(g(3), g(4), gr(3), gr(4)) == 1.0)
  }

  test("paper example: gamma sets match Example 4.1") {
    val (g, _) = Cluster.gammaSets(paperIndex, paperQueries)
    assert(g(3) == Set(4L, 9L, 3L, 8L, 15L, 6L, 11L, 13L, 14L))
    assert(g(4) == Set(9L, 3L, 8L, 15L, 6L, 11L, 13L, 14L))
  }

  test("paper example: clustering with gamma=0.8 yields {q0,q1,q2} and {q3,q4}") {
    val sim = Cluster.similarityMatrix(paperIndex, paperQueries)
    val cs = Cluster.clusterQueries(paperQueries, sim, 0.8)
      .map(_.map(_.qid).toSet).toSet
    assert(cs == Set(Set(0, 1, 2), Set(3, 4)))
  }

  test("gamma above every similarity keeps all queries separate") {
    val sim = Cluster.similarityMatrix(paperIndex, paperQueries)
    val cs = Cluster.clusterQueries(paperQueries, sim, 1.0)
    assert(cs.size == paperQueries.size)
  }

  test("gamma = 0 merges everything with positive similarity") {
    val sim = Cluster.similarityMatrix(paperIndex, paperQueries)
    val cs = Cluster.clusterQueries(paperQueries, sim, 0.0)
    // q0..q2 and q3..q4 overlap pairwise, so at most 2 groups can remain
    assert(cs.size <= 2)
  }

  test("clustering preserves the query multiset") {
    val sim = Cluster.similarityMatrix(paperIndex, paperQueries)
    for (g <- Seq(0.0, 0.3, 0.5, 0.8, 1.0)) {
      val cs = Cluster.clusterQueries(paperQueries, sim, g)
      assert(cs.flatten.map(_.qid).sorted == paperQueries.map(_.qid).sorted)
    }
  }

  test("batch similarity is the mean over pairs and lies in [0,1]") {
    val s = Cluster.batchSimilarity(paperIndex, paperQueries)
    assert(s >= 0.0 && s <= 1.0)
    assert(Cluster.batchSimilarity(paperIndex, paperQueries.take(1)) == 0.0)
  }
}
