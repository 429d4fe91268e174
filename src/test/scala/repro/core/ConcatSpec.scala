package repro.core

import org.apache.spark.sql.DataFrame
import repro.SparkSpec

/** The ⊕ operator and the exactly-once split rule in isolation. */
class ConcatSpec extends SparkSpec {
  import spark.implicits._

  private def df(rows: Seq[(Long, Seq[Long])]): DataFrame =
    rows.map { case (q, p) => (q, p, p.last, p.size - 1) }.toDF("qid", "path", "last", "len")

  private def out(res: DataFrame): Set[(Long, List[Long])] =
    res.collect().map(r => (r.getLong(0), r.getSeq[Long](1).toList)).toSet

  test("forward len == a joins backward paths on the meeting vertex") {
    val fwd = df(Seq((0L, Seq(1L)), (0L, Seq(1L, 2L))))
    val bwd = df(Seq((0L, Seq(5L)), (0L, Seq(5L, 2L)))) // G_r paths from t=5
    val res = Concat.assemble(spark, fwd, bwd, Seq(Concat.Split(0, 1L, 5L, 2, 1)))
    assert(out(res) == Set((0L, List(1L, 2L, 5L))))
  }

  test("short forward paths ending at t are emitted without a join") {
    val fwd = df(Seq((0L, Seq(1L)), (0L, Seq(1L, 5L)), (0L, Seq(1L, 2L))))
    val bwd = df(Seq((0L, Seq(5L))))
    val res = Concat.assemble(spark, fwd, bwd, Seq(Concat.Split(0, 1L, 5L, 4, 2)))
    assert(out(res) == Set((0L, List(1L, 5L))))
  }

  test("a path of length exactly a appears exactly once (trivial backward)") {
    val fwd = df(Seq((0L, Seq(1L)), (0L, Seq(1L, 2L)), (0L, Seq(1L, 2L, 5L))))
    val bwd = df(Seq((0L, Seq(5L)), (0L, Seq(5L, 2L))))
    val res = Concat.assemble(spark, fwd, bwd, Seq(Concat.Split(0, 1L, 5L, 4, 2)))
    val got = res.collect()
    assert(got.length == 1 && got.head.getSeq[Long](1) == Seq(1L, 2L, 5L))
  }

  test("non-simple concatenations are filtered (Alg. 4 line 13)") {
    val fwd = df(Seq((0L, Seq(1L, 2L, 3L))))
    val bwd = df(Seq((0L, Seq(5L, 2L, 3L)))) // reversed: 3,2,5 — revisits 2
    val res = Concat.assemble(spark, fwd, bwd, Seq(Concat.Split(0, 1L, 5L, 4, 2)))
    assert(res.count() == 0)
  }

  test("backward paths longer than k - a are excluded") {
    val fwd = df(Seq((0L, Seq(1L, 2L))))
    val bwd = df(Seq((0L, Seq(5L, 4L, 2L)))) // len 2 > k-a = 1
    val res = Concat.assemble(spark, fwd, bwd, Seq(Concat.Split(0, 1L, 5L, 2, 1)))
    assert(res.count() == 0)
  }

  test("queries are assembled independently") {
    val fwd = df(Seq((0L, Seq(1L, 2L)), (1L, Seq(1L, 2L))))
    val bwd = df(Seq((0L, Seq(5L, 2L)), (1L, Seq(6L, 2L))))
    val res = Concat.assemble(spark, fwd, bwd,
      Seq(Concat.Split(0, 1L, 5L, 2, 1), Concat.Split(1, 1L, 6L, 2, 1)))
    assert(out(res) == Set((0L, List(1L, 2L, 5L)), (1L, List(1L, 2L, 6L))))
  }

  test("a = k uses only the trivial backward path") {
    val fwd = df(Seq((0L, Seq(1L, 2L)), (0L, Seq(1L, 5L))))
    val bwd = df(Seq((0L, Seq(5L)), (0L, Seq(5L, 9L))))
    val res = Concat.assemble(spark, fwd, bwd, Seq(Concat.Split(0, 1L, 5L, 1, 1)))
    assert(out(res) == Set((0L, List(1L, 5L))))
  }

  test("the trivial forward path (len 0) never yields a result") {
    val fwd = df(Seq((0L, Seq(5L)))) // s == would-be t, len 0
    val bwd = df(Seq((0L, Seq(5L))))
    val res = Concat.assemble(spark, fwd, bwd, Seq(Concat.Split(0, 5L, 5L, 2, 1)))
    assert(res.count() == 0)
  }
}
