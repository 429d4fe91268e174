package repro.core

import java.util.concurrent.atomic.AtomicLong

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestRef}
import repro.graph.{GraphGen, GraphOps}

class DetectSpec extends SparkSpec {
  import spark.implicits._

  /** minDist table that never prunes (md = 0 for every vertex). */
  private def noPrune(vs: Seq[Long]) = vs.map(v => (v, 0)).toDF("v", "md")

  private val allPaperVerts = (0L to 15L).toSeq

  test("paper example, cluster C0 forward: dominating nodes q_{v1,2} and q_{v4,2}") {
    val edges = GraphGen.paperExample(spark)
    // C0 = {q0, q1, q2}; forward budgets ⌈5/2⌉ = 3 (Example 4.2)
    val cluster = Seq(Detect.DirQuery(0, 0L, 3), Detect.DirQuery(1, 2L, 3),
      Detect.DirQuery(2, 5L, 3))
    val psi = Detect.detect(spark, edges, cluster, noPrune(allPaperVerts), 2, new AtomicLong(0))

    val byVertex = psi.nodes.values.map(n => n.vertex -> n).toMap
    assert(psi.nodes.size == 5, s"expected 3 initial + 2 dominating, got ${psi.nodes}")
    assert(byVertex(1L).budget == 2, "q_{v1,2} expected")
    assert(byVertex(4L).budget == 2, "q_{v4,2} expected")
    // q_{v1,2} dominates all three initial queries; q_{v4,2} dominates q0,q2's
    val v1Dominated = psi.edges.filter(_.child == byVertex(1L).id).map(_.parent).toSet
    assert(v1Dominated == Set(byVertex(0L).id, byVertex(2L).id, byVertex(5L).id))
    val v4Dominated = psi.edges.filter(_.child == byVertex(4L).id).map(_.parent).toSet
    assert(v4Dominated == Set(byVertex(0L).id, byVertex(2L).id))
  }

  test("paper example, cluster C0 backward: v12 delegates to the existing q_{v12,2}") {
    val edgesRev = GraphOps.reverse(GraphGen.paperExample(spark))
    // backward budgets ⌊5/2⌋ = 2; anchors are targets v11, v13, v12
    val cluster = Seq(Detect.DirQuery(0, 11L, 2), Detect.DirQuery(1, 13L, 2),
      Detect.DirQuery(2, 12L, 2))
    val psi = Detect.detect(spark, edgesRev, cluster, noPrune(allPaperVerts), 3, new AtomicLong(0))
    val byVertex = psi.nodes.values.map(n => n.vertex -> n).toMap
    // q_{v11,2} and q_{v13,2} both reach v12 with remaining budget 1 and are
    // served by the existing q_{v12,2} (observation 2, Fig. 5(b)).
    val via12 = psi.edges.filter(_.child == byVertex(12L).id).map(_.parent).toSet
    assert(via12 == Set(byVertex(11L).id, byVertex(13L).id))
    // ... and both reach v6 with remaining 1, spawning q_{v6,1}.
    assert(byVertex.contains(6L) && byVertex(6L).budget == 1)
    val via6 = psi.edges.filter(_.child == byVertex(6L).id).map(_.parent).toSet
    assert(via6 == Set(byVertex(11L).id, byVertex(13L).id))
  }

  test("queries sharing an anchor vertex share one node with the max budget") {
    val edges = GraphGen.paperExample(spark)
    val cluster = Seq(Detect.DirQuery(0, 0L, 3), Detect.DirQuery(1, 0L, 2))
    val psi = Detect.detect(spark, edges, cluster, noPrune(allPaperVerts), 2, new AtomicLong(0))
    val anchored = psi.nodes.values.filter(_.vertex == 0L)
    assert(anchored.size == 1 && anchored.head.budget == 3)
    assert(psi.bindings(0) == (anchored.head.id, 3))
    assert(psi.bindings(1) == (anchored.head.id, 2))
  }

  test("single query produces a trivial sharing graph (no overhead edges)") {
    val edges = GraphGen.paperExample(spark)
    val psi = Detect.detect(spark, edges, Seq(Detect.DirQuery(0, 0L, 3)),
      noPrune(allPaperVerts), 2, new AtomicLong(0))
    assert(psi.nodes.size == 1 && psi.edges.isEmpty)
  }

  test("sharing graph edges never skip budget: child covers parent's remaining") {
    val edges = GraphGen.paperExample(spark)
    val cluster = Seq(Detect.DirQuery(0, 0L, 3), Detect.DirQuery(1, 2L, 3),
      Detect.DirQuery(2, 5L, 3), Detect.DirQuery(3, 4L, 2))
    val psi = Detect.detect(spark, edges, cluster, noPrune(allPaperVerts), 2, new AtomicLong(0))
    for (e <- psi.edges) {
      val child = psi.nodes(e.child); val parent = psi.nodes(e.parent)
      assert(child.budget >= parent.budget - e.depthInParent,
        s"stitch under-budgeted: $e child=$child parent=$parent")
      assert(e.depthInParent >= 1, s"zero-depth stitch $e")
    }
  }

  for (seed <- 1 to 6) {
    test(s"random graph invariants: DAG, unique anchor per vertex (seed=$seed)") {
      val es = TestRef.randomEdges(n = 30, m = 120, seed = 200 + seed)
      val edges = es.toDF("src", "dst")
      val rnd = new scala.util.Random(seed)
      val verts = es.flatMap(e => Seq(e._1, e._2)).distinct
      val cluster = (0 until 5).map(i =>
        Detect.DirQuery(i, verts(rnd.nextInt(verts.size)), 2 + rnd.nextInt(2)))
        .groupBy(_.anchor).map(_._2.head).toSeq // distinct anchors not required, but distinct qids are
        .zipWithIndex.map { case (d, i) => d.copy(qid = i) }
      val psi = Detect.detect(spark, edges, cluster,
        noPrune(verts), 3, new AtomicLong(0))
      assert(psi.isAcyclic)
      val anchors = psi.nodes.values.map(_.vertex).toSeq
      assert(anchors.distinct.size == anchors.size, "vertex anchors two nodes")
      for (e <- psi.edges) {
        val child = psi.nodes(e.child); val parent = psi.nodes(e.parent)
        assert(child.budget >= parent.budget - e.depthInParent)
      }
      // every binding points at an existing node with a covering budget
      for ((_, (nid, useB)) <- psi.bindings)
        assert(psi.nodes(nid).budget >= useB)
    }
  }
}
