package repro.core

import scala.collection.mutable

/** The query sharing graph Ψ (Def. 4.7), kept on the driver — per Theorem
  * 4.1 each vertex anchors at most one HC-s path query per cluster and
  * direction, so Ψ is tiny relative to the graph.
  *
  * Nodes are HC-s path queries `q_{vertex, budget}`. Edges are oriented
  * **dominator (child) → dominated (parent)** — the direction the worked
  * examples and Alg. 4's topological processing use (Def. 4.7's prose is
  * self-contradictory; see DESIGN.md §7). `depthInParent` is the number of
  * hops the parent's search had consumed when it first (BFS-minimally)
  * reached the child's anchor vertex; it feeds the pruning-slack
  * propagation.
  */
object SharingGraph {
  final case class Node(id: Long, vertex: Long, budget: Int)
  final case class Edge(child: Long, parent: Long, depthInParent: Int)
}

final class SharingGraph {
  import SharingGraph.{Edge, Node}

  val nodes = mutable.LinkedHashMap[Long, Node]()
  val edges = mutable.ArrayBuffer[Edge]()
  /** qid → (its anchor HC-s node, the budget it actually uses). */
  val bindings = mutable.LinkedHashMap[Int, (Long, Int)]()

  /** parent id → its dominator edges (the children that serve it). */
  private val domEdges = mutable.Map[Long, mutable.ArrayBuffer[Edge]]()
  /** child id → the edges through which it serves dominated parents. */
  private val depEdges = mutable.Map[Long, mutable.ArrayBuffer[Edge]]()

  def addNode(n: Node): Unit = nodes(n.id) = n

  /** Edges whose results `id` consumes (each `e.child` is a dominator). */
  def dominators(id: Long): Seq[Edge] = domEdges.getOrElse(id, Nil).toSeq

  /** Edges whose parents consume `id`'s results. */
  def dependents(id: Long): Seq[Edge] = depEdges.getOrElse(id, Nil).toSeq

  /** True iff `to` is reachable from `from` following child→parent edges. */
  def reaches(from: Long, to: Long): Boolean = {
    if (from == to) return true
    val seen = mutable.Set[Long]()
    val stack = mutable.Stack(from)
    while (stack.nonEmpty) {
      val u = stack.pop()
      if (u == to) return true
      if (seen.add(u)) depEdges.getOrElse(u, Nil).foreach(e => stack.push(e.parent))
    }
    false
  }

  /** Add a domination edge unless it would close a cycle (the paper's
    * `M_Q[v] ⊀ M_Q[v']` guard). Returns whether the edge was added.
    */
  def addEdge(child: Long, parent: Long, depthInParent: Int): Boolean = {
    require(nodes.contains(child) && nodes.contains(parent), s"unknown node $child/$parent")
    if (child == parent || reaches(parent, child)) return false
    val e = Edge(child, parent, depthInParent)
    edges += e
    domEdges.getOrElseUpdate(parent, mutable.ArrayBuffer()) += e
    depEdges.getOrElseUpdate(child, mutable.ArrayBuffer()) += e
    true
  }

  /** Topological level per node: a node sits strictly above all its
    * dominators, so level-0 nodes depend on nobody and caches for a level's
    * stitches are always complete. This is the processing order of Alg. 4
    * lines 6–10, batched per level.
    */
  def topoLevels(): Map[Long, Int] = {
    val memo = mutable.Map[Long, Int]()
    def level(id: Long): Int = memo.get(id) match {
      case Some(l) => l
      case None =>
        val ds = domEdges.getOrElse(id, Nil)
        val l = if (ds.isEmpty) 0 else ds.map(e => level(e.child)).max + 1
        memo(id) = l
        l
    }
    nodes.keys.foreach(level)
    memo.toMap
  }

  /** Verify acyclicity (always true by construction; used by tests). */
  def isAcyclic: Boolean =
    try { topoLevels(); true } catch { case _: StackOverflowError => false }
}
