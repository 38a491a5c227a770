package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData

class DigraphSpec extends AnyFunSuite {

  test("empty graph has no nodes or edges") {
    val g = new Digraph(10)
    assert(g.nodeCount == 0)
    assert(g.edgeCount == 0)
    assert(g.nodes.isEmpty)
  }

  test("addEdge inserts a directed edge and registers both endpoints") {
    val g = new Digraph(10)
    assert(g.addEdge(1, 2))
    assert(g.hasEdge(1, 2))
    assert(!g.hasEdge(2, 1))
    assert(g.hasNode(1) && g.hasNode(2))
    assert(g.nodeCount == 2)
  }

  test("self-loops are rejected") {
    val g = new Digraph(10)
    assert(!g.addEdge(3, 3))
    assert(g.edgeCount == 0)
    assert(!g.hasNode(3))
  }

  test("duplicate edges are deduplicated") {
    val g = new Digraph(10)
    assert(g.addEdge(1, 2))
    assert(!g.addEdge(1, 2))
    assert(g.edgeCount == 1)
    assert(g.outNeighbors(1) == Seq(2))
  }

  test("out of universe edge is rejected with an error") {
    val g = new Digraph(4)
    intercept[IllegalArgumentException](g.addEdge(1, 4))
    intercept[IllegalArgumentException](g.addEdge(-1, 2))
  }

  test("outNeighbors and inNeighbors reflect direction") {
    val g = new Digraph(10)
    g.addEdge(0, 1); g.addEdge(0, 2); g.addEdge(3, 0)
    assert(g.outNeighbors(0).toSet == Set(1, 2))
    assert(g.inNeighbors(0) == Seq(3))
    assert(g.outNeighbors(1).isEmpty)
  }

  test("nodes iterates present nodes ascending") {
    val g = new Digraph(10)
    g.addEdge(7, 2); g.addEdge(5, 7)
    assert(g.nodes.toSeq == Seq(2, 5, 7))
  }

  test("reach on a chain includes all downstream nodes and the seed") {
    val g = TestData.digraphOf(6, Seq((0, 1), (1, 2), (2, 3)))
    val r = g.reach(Iterator.single(0))
    assert((0 to 3).forall(r.get))
    assert(!r.get(4) && !r.get(5))
  }

  test("reach handles cycles without looping") {
    val g = TestData.digraphOf(4, Seq((0, 1), (1, 2), (2, 0)))
    assert(g.spreadOf(Seq(0)) == 3)
  }

  test("reach from multiple seeds unions their reach sets") {
    val g = TestData.digraphOf(8, Seq((0, 1), (2, 3), (4, 5)))
    assert(g.spreadOf(Seq(0, 2)) == 4)
    assert(g.spreadOf(Seq(0, 2, 4)) == 6)
  }

  test("spread of an isolated (absent) node is 1 — the node itself") {
    val g = TestData.digraphOf(8, Seq((0, 1)))
    assert(g.spreadOf(Seq(7)) == 1)
  }

  test("reverseReach collects all ancestors") {
    val g = TestData.digraphOf(6, Seq((0, 2), (1, 2), (2, 3), (4, 5)))
    val r = g.reverseReach(3)
    assert(Seq(0, 1, 2, 3).forall(r.get))
    assert(!r.get(4) && !r.get(5))
  }

  test("reach agrees with a reference BFS on random graphs") {
    for (seed <- 0L until 40L) {
      val edges = TestData.randomEdges(30, 60, seed)
      val g     = TestData.digraphOf(30, edges)
      val seeds = Seq((seed % 30).toInt)
      val got   = g.reach(seeds)
      val want  = TestData.referenceReach(edges, seeds)
      assert((0 until 30).filter(got.get).toSet == want, s"seed=$seed")
    }
  }

  test("reverse reach of v equals {u : v in reach(u)}") {
    val edges = TestData.randomEdges(20, 40, 99L)
    val g     = TestData.digraphOf(20, edges)
    for (v <- 0 until 20) {
      val rev  = g.reverseReach(v)
      val want = (0 until 20).filter(u => g.reach(Iterator.single(u)).get(v)).toSet
      assert((0 until 20).filter(rev.get).toSet == want)
    }
  }

  test("copy is deep: mutating the copy leaves the original untouched") {
    val g = TestData.digraphOf(10, Seq((0, 1), (1, 2)))
    val c = g.copy()
    c.addEdge(2, 3)
    assert(c.hasEdge(2, 3))
    assert(!g.hasEdge(2, 3))
    assert(g.edgeCount == 2 && c.edgeCount == 3)
    assert(g.spreadOf(Seq(0)) == 3 && c.spreadOf(Seq(0)) == 4)
  }

  test("copy preserves adjacency, nodes and edge count") {
    val edges = TestData.randomEdges(25, 80, 7L)
    val g     = TestData.digraphOf(25, edges)
    val c     = g.copy()
    assert(c.edgeCount == g.edgeCount)
    assert(c.nodes.toSeq == g.nodes.toSeq)
    for (v <- 0 until 25) assert(c.outNeighbors(v).sorted == g.outNeighbors(v).sorted)
  }
}
