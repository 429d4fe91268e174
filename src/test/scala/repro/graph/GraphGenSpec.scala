package repro.graph

import repro.{SparkSpec, TestRef}

class GraphGenSpec extends SparkSpec {

  test("uniform graph has no self loops or duplicates") {
    val e = GraphGen.uniform(spark, 100, 500, seed = 1)
    assert(e.where("src = dst").count() == 0)
    assert(e.count() == e.distinct().count())
  }

  test("uniform graph is deterministic in seed") {
    val a = GraphGen.uniform(spark, 80, 300, seed = 5).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val b = GraphGen.uniform(spark, 80, 300, seed = 5).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(a == b)
  }

  test("uniform graph vertex ids stay in range") {
    val mm = GraphGen.uniform(spark, 50, 400, seed = 2)
      .selectExpr("max(greatest(src,dst)) m", "min(least(src,dst)) n").head()
    assert(mm.getLong(0) < 50 && mm.getLong(1) >= 0)
  }

  test("power-law graph has no self loops or duplicates") {
    val e = GraphGen.powerLaw(spark, 200, 1500, seed = 3)
    assert(e.where("src = dst").count() == 0)
    assert(e.count() == e.distinct().count())
  }

  test("power-law graph keeps most of its vertices and edges") {
    val st = GraphOps.stats(GraphGen.powerLaw(spark, 2000, 20000, alpha = 2.0, seed = 4))
    assert(st.vertices > 1500, s"vertex set collapsed: $st")
    assert(st.edges > 15000, s"edge set collapsed: $st")
  }

  test("power-law graph is skewed: d_max well above d_avg") {
    val st = GraphOps.stats(GraphGen.powerLaw(spark, 2000, 20000, alpha = 2.5, seed = 4))
    assert(st.dMax > 5 * st.dAvg, s"expected skew, got $st")
  }

  test("power-law graph vertex ids stay in range") {
    val mm = GraphGen.powerLaw(spark, 300, 2000, seed = 6)
      .selectExpr("max(greatest(src,dst)) m", "min(least(src,dst)) n").head()
    assert(mm.getLong(0) < 300 && mm.getLong(1) >= 0)
  }

  test("paper example graph matches the transcribed edge list") {
    val got = GraphGen.paperExample(spark).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(got == GraphGen.paperExampleEdges.toSet)
  }

  test("paper example: q0's three HC-s-t paths exist as edges") {
    val es = GraphGen.paperExampleEdges.toSet
    def pathOk(p: Seq[Long]) = p.sliding(2).forall(w => es.contains((w(0), w(1))))
    assert(pathOk(Seq(0, 1, 7, 10, 12, 11)))
    assert(pathOk(Seq(0, 4, 9, 3, 6, 11)))
    assert(pathOk(Seq(0, 4, 9, 15, 6, 11)))
  }

  test("paper example: index entries of Fig. 2(b) hold (dist to v14)") {
    val adj = TestRef.adjacency(TestRef.reverse(GraphGen.paperExampleEdges))
    val d = TestRef.bfs(adj, 14L, 10)
    assert(d(6L) == 1); assert(d(3L) == 2); assert(d(15L) == 2)
    assert(d(9L) == 3); assert(d(4L) == 4)
    assert(!d.contains(8L), "dist(v8, v14) must be infinite (Example 3.1)")
  }

  test("paper example: Gamma sets of Example 4.1 hold") {
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    val g3 = TestRef.bfs(adj, 4L, 4).keySet   // q3(v4, v14, 4)
    val g4 = TestRef.bfs(adj, 9L, 3).keySet   // q4(v9, v14, 3)
    assert(g3 == Set(4L, 9L, 3L, 8L, 15L, 6L, 11L, 13L, 14L))
    assert(g4 == Set(9L, 3L, 8L, 15L, 6L, 11L, 13L, 14L))
  }

  test("vertex sampling: fraction 1.0 is identity") {
    val e = GraphGen.uniform(spark, 60, 200, seed = 9)
    assert(GraphGen.sampleVertices(e, 1.0).count() == e.count())
  }

  test("vertex sampling: smaller fraction keeps fewer edges, monotonically") {
    val e = GraphGen.powerLaw(spark, 500, 4000, seed = 10)
    val c100 = e.count()
    val c60 = GraphGen.sampleVertices(e, 0.6).count()
    val c20 = GraphGen.sampleVertices(e, 0.2).count()
    assert(c20 < c60 && c60 < c100, s"$c20 < $c60 < $c100 expected")
  }

  test("reverse graph flips every edge") {
    val e = GraphGen.paperExample(spark)
    val r = GraphOps.reverse(e).collect().map(x => (x.getLong(0), x.getLong(1))).toSet
    assert(r == GraphGen.paperExampleEdges.map(_.swap).toSet)
  }

  test("stats on the paper example") {
    val st = GraphOps.stats(GraphGen.paperExample(spark))
    assert(st.edges == GraphGen.paperExampleEdges.size)
    assert(st.vertices == 16)
    assert(st.dMax >= 3)
  }
}
