package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.Oracle

/** Ground-truth HC-s-t path enumeration on DuckDB via a recursive CTE,
  * checked against a Spark result with `repro.Oracle.assertEquivalent`.
  *
  * Paths are compared as `"->"`-joined vertex strings (array columns are
  * not comparable through the oracle). The CTE performs the naive
  * depth-bounded simple-path expansion — an implementation entirely
  * independent from the Spark engine under test, so a broken pruning rule,
  * stitch, or concatenation is caught as a row diff.
  */
object PathOracle {

  val sql: String =
    """WITH RECURSIVE walk AS (
      |  SELECT q.qid AS qid, q.s AS last, q.t AS t, CAST(q.k AS INT) AS k,
      |         q.s AS path, 0 AS len
      |  FROM queries q
      |  UNION ALL
      |  SELECT w.qid, e.dst, w.t, w.k, w.path || '->' || e.dst, w.len + 1
      |  FROM walk w JOIN edges e ON e.src = w.last
      |  WHERE w.len < w.k
      |    AND NOT list_contains(string_split(w.path, '->'), e.dst)
      |)
      |SELECT qid, path FROM walk WHERE last = t AND len >= 1
      |""".stripMargin

  /** Assert `result` (`(qid, path: array<bigint>)`) equals the ground truth
    * for `queries` over `edges`.
    */
  def check(spark: SparkSession, edges: DataFrame, queries: Seq[PathQuery],
            result: DataFrame): Unit = {
    import spark.implicits._
    val got = result.select(
      col("qid").cast("string") as "qid",
      concat_ws("->", col("path")) as "path")
    val qdf = queries.map(q => (q.qid.toLong, q.s, q.t, q.k)).toDF("qid", "s", "t", "k")
    Oracle.assertEquivalent(got, sql, "edges" -> edges, "queries" -> qdf)
  }
}
