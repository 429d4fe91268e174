package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.graph.GraphGen

/** Synthetic stand-ins for the paper's twelve real-world graphs (Table I).
  *
  * The originals (SNAP/LAW/NetworkRepository, up to 1.8B edges) are not
  * available offline and would not fit a `local[*]` bench anyway. Each
  * stand-in is a community-structured digraph (`GraphGen.community`) scaled
  * down ~10–2000x in vertex count while mirroring the original's *shape* —
  * average degree, degree skew (per-community hubs), and the community
  * locality of real social/web graphs. Community structure is what lets a
  * scaled-down graph behave like the real one for this paper: k-hop balls
  * stay small relative to |V| (so query similarity, Def. 4.5, spans its
  * range instead of saturating) while simple-path counts inside a
  * community grow combinatorially (so enumeration dominates, Fig. 13's
  * regime). See DESIGN.md §4.
  */
object Datasets {

  final case class Spec(name: String, paper: String, commSize: Long,
                        gen: SparkSession => DataFrame)

  private def c(n: Long, m: Long, commSize: Long, pInter: Double, alpha: Double,
                seed: Long): (Long, SparkSession => DataFrame) =
    (commSize, s => GraphGen.community(s, n, m, commSize, pInter, alpha, seed))

  private def spec(name: String, paper: String,
                   g: (Long, SparkSession => DataFrame)): Spec =
    Spec(name, paper, g._1, g._2)

  val all: Seq[Spec] = Seq(
    spec("EP", "Epinions 75K/508K (d_avg 13.4)",      c(12000, 144000, 400, 0.0003, 1.3, 101)),
    spec("SL", "Slashdot 82K/948K (d_avg 21.2)",      c(12000, 168000, 400, 0.0003, 1.3, 102)),
    spec("BK", "Baidu-baike 416K/3M (d_avg 5, d_max 98K)", c(16000, 96000, 200, 0.0005, 2.0, 103)),
    spec("WT", "WikiTalk 2M/5M (d_avg 5.0)",          c(20000, 100000, 200, 0.0005, 1.5, 104)),
    spec("BS", "BerkStan 685K/7M (d_avg 22.2)",       c(8000, 96000, 400, 0.0003, 1.2, 105)),
    spec("SK", "Skitter 1.6M/11M (d_avg 13.1)",       c(12000, 120000, 300, 0.0003, 1.3, 106)),
    spec("UK", "Web-uk-2005 130K/11.7M (d_avg 181)",  c(8000, 160000, 500, 0.0002, 1.0, 107)),
    spec("DA", "Rec-dating 169K/17M (d_avg 206)",     c(8000, 144000, 500, 0.0002, 1.1, 108)),
    spec("PO", "Pokec 1.6M/31M (d_avg 37.5)",         c(12000, 120000, 300, 0.0003, 1.0, 109)),
    spec("LJ", "LiveJournal 4M/69M (d_avg 17.9)",     c(16000, 160000, 400, 0.0003, 1.3, 110)),
    spec("TW", "Twitter-2010 42M/1.46B (d_avg 70.5, d_max 3M)",
      c(24000, 288000, 400, 0.0003, 1.8, 111)),
    spec("FS", "Friendster 65M/1.81B (d_avg 27.5)",   c(32000, 320000, 400, 0.0002, 1.2, 112)),
  )

  def byName(name: String): Spec =
    all.find(_.name == name).getOrElse(sys.error(s"unknown dataset $name"))

  /** Default experiment subset: one sparse-skewed, one sparse, one dense,
    * and the largest ("billion-scale" stand-in) graph. Table I still covers
    * all twelve; `jobs/` mains accept an explicit list to run more.
    */
  val defaultSubset: Seq[String] = Seq("EP", "WT", "UK", "FS")

  /** The two largest graphs, used by the Exp-5 scalability sweep. */
  val largest: Seq[String] = Seq("TW", "FS")
}
