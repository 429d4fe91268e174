package repro.baselines

import org.apache.spark.sql.DataFrame
import repro.{SparkSpec, TestRef}
import repro.core.{BasicEnum, PathOracle, PathQuery}
import repro.graph.GraphGen

class KSPSpec extends SparkSpec {
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

  test("OnePass-adapted matches the reference on the paper example") {
    val edges = GraphGen.paperExample(spark)
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    val res = asSets(KSP.onePass(spark, edges, paperQueries))
    for (q <- paperQueries)
      assert(res(q.qid.toLong) == TestRef.hcstPaths(adj, q.s, q.t, q.k), s"q${q.qid}")
  }

  test("DkSP-adapted matches the reference on the paper example") {
    val edges = GraphGen.paperExample(spark)
    val adj = TestRef.adjacency(GraphGen.paperExampleEdges)
    val res = asSets(KSP.dkSP(spark, edges, paperQueries))
    for (q <- paperQueries)
      assert(res(q.qid.toLong) == TestRef.hcstPaths(adj, q.s, q.t, q.k), s"q${q.qid}")
  }

  test("OnePass-adapted matches the DuckDB oracle") {
    val edges = GraphGen.paperExample(spark)
    PathOracle.check(spark, edges, paperQueries, KSP.onePass(spark, edges, paperQueries))
  }

  for (seed <- 1 to 4) {
    test(s"random graph: both KSP adaptations equal BasicEnum (seed=$seed)") {
      val es = TestRef.randomEdges(n = 20, m = 55, seed = 400 + seed)
      val edges = es.toDF("src", "dst")
      val adj = TestRef.adjacency(es)
      val rnd = new scala.util.Random(seed)
      val qs = (0 until 3).flatMap { i =>
        val s = rnd.nextInt(20).toLong
        val reach = TestRef.bfs(adj, s, 4).keySet - s
        if (reach.isEmpty) None
        else Some(PathQuery(i, s, reach.toVector(rnd.nextInt(reach.size)), 3 + rnd.nextInt(2)))
      }
      if (qs.nonEmpty) {
        val ref = asSets(BasicEnum.run(spark, edges, qs))
        assert(asSets(KSP.onePass(spark, edges, qs)) == ref, "onePass")
        assert(asSets(KSP.dkSP(spark, edges, qs)) == ref, "dkSP")
      }
    }
  }
}
