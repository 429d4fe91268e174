package repro

import org.apache.spark.sql.functions._

/** Provided TPC-H-lite infrastructure stays exercised (the paper itself is
  * graph-only; GraphGen supplies its datasets — see DESIGN.md §4).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }

  test("orders keys are dense and unique") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.count() == o.select("o_orderkey").distinct().count())
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, 0.001, seed = 3).agg(sum("c_acctbal")).head.getDouble(0)
    val b = SynthData.customer(spark, 0.001, seed = 3).agg(sum("c_acctbal")).head.getDouble(0)
    assert(a == b)
  }

  test("zipf keys are skewed towards small ranks") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
    val top = z.where("k <= 10").count().toDouble / 20000
    assert(top > 0.3, s"zipf head mass only $top")
  }

  test("uniform keys cover the domain roughly evenly") {
    val u = SynthData.uniformKeys(spark, 20000, 100)
    val top = u.where("k <= 10").count().toDouble / 20000
    assert(top > 0.05 && top < 0.2, s"uniform head mass $top")
  }

  test("Oracle.assertEquivalent validates a Spark aggregate against DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt")
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(got,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("Oracle catches a wrong result (self-test)") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(100)
    val wrong = li.groupBy("l_returnflag")
      .agg((count(lit(1)) + 1) as "cnt")
      .select(col("l_returnflag"), col("cnt"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("PathOracle catches a missing path (self-test)") {
    import spark.implicits._
    val edges = Seq((0L, 1L), (1L, 2L)).toDF("src", "dst")
    val qs = Seq(core.PathQuery(0, 0L, 2L, 3))
    val incomplete = Seq((0L, Seq(0L, 1L))).toDF("qid", "path") // wrong: not reaching t
    intercept[IllegalArgumentException] {
      core.PathOracle.check(spark, edges, qs, incomplete)
    }
  }
}
