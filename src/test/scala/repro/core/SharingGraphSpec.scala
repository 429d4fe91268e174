package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Pure driver-side structure — no SparkSession needed. */
class SharingGraphSpec extends AnyFunSuite {
  import SharingGraph.Node

  private def graph(n: Int): SharingGraph = {
    val g = new SharingGraph
    (0 until n).foreach(i => g.addNode(Node(i.toLong, 100L + i, 3)))
    g
  }

  test("addEdge records dominator and dependent views consistently") {
    val g = graph(3)
    assert(g.addEdge(0, 1, 1))
    assert(g.addEdge(0, 2, 2))
    assert(g.dominators(1).map(_.child) == Seq(0L))
    assert(g.dominators(2).map(_.child) == Seq(0L))
    assert(g.dependents(0).map(_.parent).toSet == Set(1L, 2L))
    assert(g.edges.size == 2)
  }

  test("self edges are rejected") {
    val g = graph(1)
    assert(!g.addEdge(0, 0, 1))
    assert(g.edges.isEmpty)
  }

  test("direct cycles are rejected") {
    val g = graph(2)
    assert(g.addEdge(0, 1, 1))
    assert(!g.addEdge(1, 0, 1), "reverse edge must be refused (the ⊀ guard)")
    assert(g.edges.size == 1)
  }

  test("transitive cycles are rejected") {
    val g = graph(4)
    assert(g.addEdge(0, 1, 1))
    assert(g.addEdge(1, 2, 1))
    assert(g.addEdge(2, 3, 1))
    assert(!g.addEdge(3, 0, 1), "3→0 closes 0→1→2→3→0")
    assert(g.isAcyclic)
  }

  test("reaches follows child→parent direction only") {
    val g = graph(3)
    g.addEdge(0, 1, 1); g.addEdge(1, 2, 1)
    assert(g.reaches(0, 2))
    assert(!g.reaches(2, 0))
    assert(g.reaches(1, 1))
  }

  test("topo levels: dominators strictly below dominated") {
    val g = graph(5)
    g.addEdge(0, 1, 1); g.addEdge(1, 2, 1); g.addEdge(0, 3, 2); g.addEdge(3, 4, 1)
    val l = g.topoLevels()
    assert(l(0L) == 0)
    assert(l(1L) == 1 && l(3L) == 1)
    assert(l(2L) == 2 && l(4L) == 2)
    for (e <- g.edges) assert(l(e.child) < l(e.parent))
  }

  test("isolated nodes sit at level 0") {
    val g = graph(3)
    g.addEdge(0, 1, 1)
    assert(g.topoLevels()(2L) == 0)
  }

  test("random DAG stress: inserted edges always respect topo order") {
    val rnd = new scala.util.Random(1)
    val g = graph(30)
    for (_ <- 1 to 300) {
      val a = rnd.nextInt(30).toLong; val b = rnd.nextInt(30).toLong
      g.addEdge(a, b, 1 + rnd.nextInt(3))
    }
    assert(g.isAcyclic)
    val l = g.topoLevels()
    for (e <- g.edges) assert(l(e.child) < l(e.parent))
  }

  test("bindings survive alongside structure") {
    val g = graph(2)
    g.bindings(7) = (0L, 2)
    g.bindings(9) = (0L, 3)
    assert(g.bindings(7) == (0L, 2) && g.bindings.size == 2)
  }
}
