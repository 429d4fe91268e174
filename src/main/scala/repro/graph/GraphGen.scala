package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType

/** Deterministic synthetic directed-graph generators.
  *
  * The paper evaluates on twelve real-world graphs (SNAP/LAW/
  * NetworkRepository, up to 1.8B edges). Those are unavailable offline, so
  * every bench dataset is a synthetic stand-in generated here (see
  * DESIGN.md §4). All generators are deterministic in their (size, seed)
  * arguments and return an edge DataFrame with schema
  * `(src: bigint, dst: bigint)`, de-duplicated and self-loop free, with
  * vertex ids in `[0, n)`.
  */
object GraphGen {

  /** Canonicalize a raw edge set: drop self loops and duplicates. */
  private def canon(raw: DataFrame): DataFrame =
    raw.where(col("src") =!= col("dst")).distinct()

  /** Uniform (Erdős–Rényi-style) digraph: `m` edges drawn uniformly over
    * `[0,n) x [0,n)`. Duplicates are dropped, so the realized edge count is
    * slightly below `m` for dense settings.
    */
  def uniform(spark: SparkSession, n: Long, m: Long, seed: Long = 7): DataFrame = {
    val raw = spark.range(m).select(
      (rand(seed) * n).cast(LongType) as "src",
      (rand(seed + 1) * n).cast(LongType) as "dst",
    )
    canon(raw)
  }

  /** Power-law-ish digraph: endpoints drawn as `floor(n · u^beta)` for
    * uniform `u` (density ∝ x^(1/beta - 1), heavy near the hot end), then
    * scattered by independent affine permutations mod `n` so src-hubs and
    * dst-hubs are different vertices. `beta = 1` is uniform; larger `beta`
    * concentrates degree mass on fewer hubs — this mirrors the heavy-tailed
    * degree skew (`d_max >> d_avg`) of the paper's social/web graphs while
    * keeping the vertex set fully populated (a raw zipf inverse-CDF dumps
    * most mass on a handful of ranks and collapses under `distinct()`).
    */
  def powerLaw(spark: SparkSession, n: Long, m: Long, alpha: Double = 2.0,
               seed: Long = 11): DataFrame = {
    def skew(s: Long) =
      least(lit(n - 1), (pow(rand(s), lit(alpha)) * n).cast(LongType))
    val raw = spark.range(m).select(
      pmod(skew(seed) * 2654435761L + 13L, lit(n)) as "src",
      pmod(skew(seed + 1) * 2246822519L + 57L, lit(n)) as "dst",
    )
    canon(raw)
  }

  /** Community-structured digraph — the bench stand-in for the paper's
    * social/web graphs.
    *
    * Vertices are partitioned into communities of `commSize`; each edge
    * stays inside its source's community with probability `1 - pInter`
    * (endpoint offsets drawn with skew `alpha`, hubs per community) and
    * jumps to a uniform global vertex otherwise. This decouples the two
    * quantities the experiments need — k-hop balls stay community-sized
    * (so Def. 4.5 similarity is informative rather than saturated) while
    * simple-path multiplicity inside a community stays high (so enumeration
    * cost dominates overhead) — exactly the locality that real social
    * networks exhibit and uniform random graphs lack (DESIGN.md §4).
    */
  def community(spark: SparkSession, n: Long, m: Long, commSize: Long,
                pInter: Double = 0.05, alpha: Double = 1.5,
                seed: Long = 17): DataFrame = {
    require(n % commSize == 0, s"n=$n must be a multiple of commSize=$commSize")
    val nComm = n / commSize
    def off(s: Long) =
      least(lit(commSize - 1), (pow(rand(s), lit(alpha)) * commSize).cast(LongType))
    val comm = (rand(seed) * nComm).cast(LongType)
    val raw = spark.range(m).select(
      (comm * commSize + off(seed + 1)) as "src",
      when(rand(seed + 2) < pInter, (rand(seed + 3) * n).cast(LongType))
        .otherwise(comm * commSize + off(seed + 4)) as "dst",
    )
    canon(raw)
  }

  /** The 16-vertex example graph of Fig. 1 (vertices v0..v15), used by the
    * worked examples of Sections II–IV and by our unit tests.
    *
    * Edges transcribed from the figure so that the paper's stated results
    * hold: P(q0(v0,v11,5)) = {(v0,v1,v7,v10,v12,v11), (v0,v4,v9,v3,v6,v11),
    * (v0,v4,v9,v15,v6,v11)}, the analogous paths for q1(v2,v13,5), the
    * index entries of Fig. 2(b), the Γ sets of Example 4.1, and the HC-s
    * path sets of Examples 4.2/4.3.
    */
  val paperExampleEdges: Seq[(Long, Long)] = Seq(
    0L -> 1L, 0L -> 4L,           // v0 -> v1, v4
    2L -> 1L, 2L -> 4L,           // v2 -> v1, v4
    5L -> 1L,                     // v5 -> v1
    1L -> 7L, 1L -> 8L,           // v1 -> v7, v8
    7L -> 10L, 7L -> 8L,          // v7 -> v10, v8
    10L -> 12L,                   // v10 -> v12
    12L -> 11L, 12L -> 13L,       // v12 -> v11, v13
    4L -> 9L,                     // v4 -> v9
    9L -> 3L, 9L -> 15L, 9L -> 8L, // v9 -> v3, v15, v8
    3L -> 6L, 3L -> 15L,          // v3 -> v6, v15 (Example 3.1 explores v15 from prefix (v4,v9,v3))
    15L -> 6L,                    // v15 -> v6
    6L -> 11L, 6L -> 13L, 6L -> 14L, // v6 -> v11, v13, v14
    // NOTE: no v13 -> v14 edge — Fig. 2(b)'s index stores exactly
    // {v6, v3, v15, v9, v4} as the vertices reaching v14, so v13 must not.
  )

  def paperExample(spark: SparkSession): DataFrame = {
    import spark.implicits._
    paperExampleEdges.toDF("src", "dst")
  }

  /** Vertex-induced random subgraph keeping roughly `fraction` of vertices
    * (deterministic in seed) — used by the Exp-5 scalability sweep exactly
    * as the paper samples its two largest graphs from 20% to 100%.
    */
  def sampleVertices(edges: DataFrame, fraction: Double, seed: Long = 31): DataFrame = {
    require(fraction > 0 && fraction <= 1.0, s"bad fraction $fraction")
    if (fraction >= 1.0) edges
    else {
      val keep = (v: org.apache.spark.sql.Column) =>
        pmod(v * 2654435761L + seed, lit(1000000L)) < (fraction * 1000000L).toLong
      edges.where(keep(col("src")) && keep(col("dst")))
    }
  }
}
