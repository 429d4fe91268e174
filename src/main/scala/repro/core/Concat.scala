package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Path concatenation `⊕` (Def. 3.1) plus the final assembly of HC-s-t
  * paths from the two directional searches (Alg. 1 lines 7–8, Alg. 4 lines
  * 11–13).
  *
  * For a query with forward budget `a` and hop constraint `k`, the result
  * set is produced exactly once per path by the split rule
  *
  *   { forward paths of len < a that already end at t }  ∪
  *   { forward paths of len == a } ⊕ { reversed backward paths of len <= k-a }
  *
  * (a path of length L < a appears only in the first part; a path of length
  * L >= a has the unique split at position a). A final
  * `array_distinct`-size filter enforces simplicity of the concatenated
  * path, exactly as the pseudo-code checks for duplicated vertices.
  */
object Concat {

  /** Per-query split info: `(qid, s, t, k, a)` with `1 <= a <= k`. */
  final case class Split(qid: Int, s: Long, t: Long, k: Int, a: Int) {
    require(a >= 1 && a <= k, s"bad split a=$a for k=$k")
    def b: Int = k - a
  }

  /** @param fwd `(qid, path, last, len)` forward simple paths from `s` on G
    * @param bwd `(qid, path, last, len)` backward paths from `t` on G_r
    *            (i.e. `path(0) == t`; reversed they end at `t`)
    * @return `(qid, path)` — all simple HC-s-t paths per query
    */
  def assemble(spark: SparkSession, fwd: DataFrame, bwd: DataFrame,
               splits: Seq[Split]): DataFrame = {
    import spark.implicits._
    val sp = broadcast(
      splits.map(s => (s.qid.toLong, s.t, s.k, s.a)).toDF("qid", "t", "k", "a"))

    val short = fwd
      .join(sp, Seq("qid"))
      .where(col("len") < col("a") && col("len") >= 1 && col("last") === col("t"))
      .select(col("qid"), col("path"))

    val f = fwd.join(sp, Seq("qid")).where(col("len") === col("a"))
      .select(col("qid"), col("path") as "fpath", col("last") as "flast")
    val b = bwd.join(sp, Seq("qid")).where(col("len") <= col("k") - col("a"))
      .select(col("qid") as "bqid", col("path") as "bpath",
        col("last") as "blast", col("len") as "blen")
    val joined = f
      .join(b, f("qid") === b("bqid") && f("flast") === b("blast"))
      // bpath = (t, ..., meet); drop the meeting vertex and reverse to get
      // the continuation (…, t), then append to the forward half.
      .select(col("qid"),
        concat(col("fpath"), reverse(slice(col("bpath"), lit(1), col("blen")))) as "path")

    short.unionAll(joined)
      .where(size(array_distinct(col("path"))) === size(col("path")))
  }
}
