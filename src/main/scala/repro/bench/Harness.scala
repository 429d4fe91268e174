package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.storage.StorageLevel

import repro.baselines.KSP
import repro.core.{BasicEnum, BatchEnum, PathQuery, PhaseTimings}

/** Shared bench machinery: the algorithm roster of Section V, wall-clock
  * timing with forced materialization, and markdown table rendering (the
  * printed rows are what EXPERIMENTS.md quotes).
  */
object Harness {

  /** The algorithms compared in the evaluation (Section V "Algorithms"). */
  sealed abstract class Algo(val name: String) {
    def run(spark: SparkSession, edges: DataFrame, qs: Seq[PathQuery],
            gamma: Double): DataFrame
  }
  case object PathEnumA extends Algo("PathEnum") {
    def run(s: SparkSession, e: DataFrame, q: Seq[PathQuery], g: Double): DataFrame =
      BasicEnum.run(s, e, q, optimized = true, perQueryIndex = true)
  }
  case object BasicEnumA extends Algo("BasicEnum") {
    def run(s: SparkSession, e: DataFrame, q: Seq[PathQuery], g: Double): DataFrame =
      BasicEnum.run(s, e, q)
  }
  case object BasicEnumP extends Algo("BasicEnum+") {
    def run(s: SparkSession, e: DataFrame, q: Seq[PathQuery], g: Double): DataFrame =
      BasicEnum.run(s, e, q, optimized = true)
  }
  case object BatchEnumA extends Algo("BatchEnum") {
    def run(s: SparkSession, e: DataFrame, q: Seq[PathQuery], g: Double): DataFrame =
      BatchEnum.run(s, e, q, gamma = g).paths
  }
  case object BatchEnumP extends Algo("BatchEnum+") {
    def run(s: SparkSession, e: DataFrame, q: Seq[PathQuery], g: Double): DataFrame =
      BatchEnum.run(s, e, q, gamma = g, optimized = true).paths
  }
  case object DkSPA extends Algo("DkSP") {
    def run(s: SparkSession, e: DataFrame, q: Seq[PathQuery], g: Double): DataFrame =
      KSP.dkSP(s, e, q)
  }
  case object OnePassA extends Algo("OnePass") {
    def run(s: SparkSession, e: DataFrame, q: Seq[PathQuery], g: Double): DataFrame =
      KSP.onePass(s, e, q)
  }

  val coreAlgos: Seq[Algo] = Seq(PathEnumA, BasicEnumA, BasicEnumP, BatchEnumA, BatchEnumP)

  final case class Cell(algo: String, millis: Long, paths: Long)

  /** Time one algorithm end-to-end (index + detection + enumeration); the
    * returned path count doubles as the cross-algorithm consistency check.
    */
  def time(spark: SparkSession, algo: Algo, edges: DataFrame,
           qs: Seq[PathQuery], gamma: Double = 0.5): Cell = {
    val t0 = System.nanoTime()
    val res = algo.run(spark, edges, qs, gamma)
    val n = res.count()
    Cell(algo.name, (System.nanoTime() - t0) / 1000000L, n)
  }

  /** Persisted edge table for a dataset (callers must unpersist). */
  def loadEdges(spark: SparkSession, spec: Datasets.Spec): DataFrame = {
    val e = spec.gen(spark).persist(StorageLevel.MEMORY_AND_DISK)
    e.count()
    e
  }

  /** BatchEnum+ with phase timings exposed (Exp-3). */
  def timePhases(spark: SparkSession, edges: DataFrame, qs: Seq[PathQuery],
                 gamma: Double = 0.5): (PhaseTimings, Long) = {
    val r = BatchEnum.run(spark, edges, qs, gamma, optimized = true)
    (r.timings, r.paths.count())
  }

  // ---- table rendering ----------------------------------------------------

  def renderTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val sb = new StringBuilder
    sb.append(s"\n### $title\n\n")
    sb.append(header.mkString("| ", " | ", " |\n"))
    sb.append(header.map(_ => "---").mkString("| ", " | ", " |\n"))
    rows.foreach(r => sb.append(r.mkString("| ", " | ", " |\n")))
    sb.toString
  }

  def printTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val s = renderTable(title, header, rows)
    println(s)
    s
  }

  def ms(x: Long): String = x.toString
  def f2(x: Double): String = f"$x%.2f"
}
