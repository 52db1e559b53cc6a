package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.TestFixtures

class DijkstraSpec extends AnyFunSuite {
  private val adj = TestFixtures.pentaAdjacency

  test("distances on the hand-built graph") {
    val d = Dijkstra.distances(adj, 0)
    assert(d.toMap === Map(0 -> 0.0, 1 -> 1.0, 2 -> 3.0, 3 -> 6.0, 4 -> 7.0))
  }

  test("shortestPath start to end") {
    assert(Dijkstra.shortestPath(adj, 0, 3).contains(6.0))
    assert(Dijkstra.shortestPath(adj, 0, 4).contains(7.0))
    assert(Dijkstra.shortestPath(adj, 0, 0).contains(0.0))
  }

  test("shortestPath returns None when unreachable") {
    val dag = Array(Array((1, 1.0)), Array.empty[(Int, Double)], Array((1, 1.0)))
    assert(Dijkstra.shortestPath(dag, 0, 2).isEmpty)
  }

  test("nearestTagged finds the closest tagged vertex") {
    assert(Dijkstra.nearestTagged(adj, 0, _ == 4).contains((4, 7.0)))
    assert(Dijkstra.nearestTagged(adj, 0, Set(2, 3).contains).contains((2, 3.0)))
  }

  test("nearestTagged of a tagged start is the start itself") {
    assert(Dijkstra.nearestTagged(adj, 0, _ == 0).contains((0, 0.0)))
  }

  test("nearestTagged returns None when no tagged vertex is reachable") {
    val dag = Array(Array((1, 1.0)), Array.empty[(Int, Double)], Array((1, 1.0)))
    assert(Dijkstra.nearestTagged(dag, 1, _ == 0).isEmpty)
  }

  test("distances with a bound only settles vertices within the bound") {
    val d = Dijkstra.distances(adj, 0, bound = 3.5)
    assert(d.keySet === Set(0, 1, 2))
  }

  test("triangle inequality holds on a grid network") {
    val g = TestFixtures.tiny
    val a = g.adjacency
    val d0 = Dijkstra.distances(a, 0)
    // d(0, v) <= d(0, u) + w(u, v) for every edge (u, v)
    g.edgeList.foreach { case (u, v, w) =>
      assert(d0(v) <= d0(u) + w + 1e-9)
    }
  }

  test("grid distances are bounded below by Manhattan distance") {
    val g = TestFixtures.tiny
    val d0 = Dijkstra.distances(g.adjacency, 0)
    for (v <- Seq(1, g.side, g.numVertices - 1)) {
      val manhattan = g.xOf(v) + g.yOf(v) // from vertex 0 at (0, 0); min weight 1.0
      assert(d0(v) >= manhattan - 1e-9)
    }
  }
}
