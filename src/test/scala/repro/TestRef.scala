package repro

import scala.collection.mutable

/** Driver-side reference implementations used to cross-check the Spark
  * engine (in addition to the DuckDB oracle, which is independent of both).
  */
object TestRef {

  type Adj = Map[Long, Seq[Long]]

  def adjacency(edges: Seq[(Long, Long)]): Adj =
    edges.distinct.filter(e => e._1 != e._2).groupBy(_._1)
      .map { case (s, es) => s -> es.map(_._2) }

  def reverse(edges: Seq[(Long, Long)]): Seq[(Long, Long)] = edges.map(e => (e._2, e._1))

  /** BFS hop distances from `src`, capped at `maxHops`. */
  def bfs(adj: Adj, src: Long, maxHops: Int): Map[Long, Int] = {
    val dist = mutable.Map(src -> 0)
    var frontier = List(src)
    var d = 0
    while (frontier.nonEmpty && d < maxHops) {
      d += 1
      frontier = for {
        u <- frontier
        v <- adj.getOrElse(u, Nil)
        if !dist.contains(v)
      } yield { dist(v) = d; v }
    }
    dist.toMap
  }

  /** All simple paths s->t with at most k hops (naive DFS). */
  def hcstPaths(adj: Adj, s: Long, t: Long, k: Int): Set[List[Long]] = {
    val out = mutable.Set[List[Long]]()
    def rec(path: List[Long], seen: Set[Long]): Unit = {
      val u = path.head
      if (u == t && path.size > 1) out += path.reverse
      if (path.size - 1 < k)
        for (v <- adj.getOrElse(u, Nil) if !seen(v)) rec(v :: path, seen + v)
    }
    rec(List(s), Set(s))
    out.toSet
  }

  /** All simple paths from `s` of length <= k (HC-s path query, Def. 4.2
    * with the <=-budget convention the algorithms use).
    */
  def hcsPaths(adj: Adj, s: Long, k: Int): Set[List[Long]] = {
    val out = mutable.Set[List[Long]]()
    def rec(path: List[Long], seen: Set[Long]): Unit = {
      out += path.reverse
      if (path.size - 1 < k)
        for (v <- adj.getOrElse(path.head, Nil) if !seen(v)) rec(v :: path, seen + v)
    }
    rec(List(s), Set(s))
    out.toSet
  }

  /** Deterministic random digraph as an edge list (mirrors GraphGen scale). */
  def randomEdges(n: Int, m: Int, seed: Long): Seq[(Long, Long)] = {
    val rnd = new scala.util.Random(seed)
    (1 to m).map(_ => (rnd.nextInt(n).toLong, rnd.nextInt(n).toLong))
      .filter(e => e._1 != e._2).distinct
  }
}
