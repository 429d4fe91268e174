package repro
import repro.bench.{Datasets, Harness}
import repro.core.{Cluster, DistIndex, QueryGen}
class CalibSpec extends SparkSpec {
  test("phases") {
    for (name <- Seq("UK", "EP")) {
      val spec = Datasets.byName(name)
      val edges = Harness.loadEdges(spark, spec)
      val gen = QueryGen(edges, seed = 1, locality = Some(spec.commSize))
      for (sim <- Seq(0.0, 0.9)) {
        val qs = gen.similarBatch(32, sim, 4, 5).zipWithIndex.map { case (q, i) => q.copy(qid = i) }
        val basic = Harness.time(spark, Harness.BasicEnumA, edges, qs)
        val t0 = System.nanoTime()
        val (ph, n) = Harness.timePhases(spark, edges, qs)
        val tot = (System.nanoTime()-t0)/1000000
        println(f"PH $name sim=$sim basic=${basic.millis} batchTot=$tot idx=${ph.buildIndexMs} clu=${ph.clusterQueryMs} det=${ph.identifySubqueryMs} enum=${ph.enumerationMs} paths=${basic.paths}($n)")
      }
      edges.unpersist()
    }
  }
}
