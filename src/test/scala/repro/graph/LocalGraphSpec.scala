package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.setalg.SetFactory
import scala.util.Random

class LocalGraphSpec extends AnyFunSuite {

  test("fromEdges symmetrises, dedupes, drops self-loops") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (1, 0), (1, 1), (2, 3), (2, 3)))
    assert(g.n == 4)
    assert(g.m == 2)
    assert(g.neighbors(0).toSeq == Seq(1))
    assert(g.neighbors(1).toSeq == Seq(0))
    assert(g.neighbors(2).toSeq == Seq(3))
    assert(g.degree(1) == 1)
  }

  test("neighbors are sorted") {
    val g = LocalGraph.fromEdges(5, Seq((2, 4), (2, 0), (2, 3), (2, 1)))
    assert(g.neighbors(2).toSeq == Seq(0, 1, 3, 4))
  }

  test("hasEdge both directions, absent edges") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2)))
    assert(g.hasEdge(0, 1) && g.hasEdge(1, 0))
    assert(g.hasEdge(1, 2) && g.hasEdge(2, 1))
    assert(!g.hasEdge(0, 2) && !g.hasEdge(0, 3))
  }

  test("complete graph K5 invariants") {
    val g = LocalGraph.complete(5)
    assert(g.n == 5 && g.m == 10 && g.maxDegree == 4)
    for (v <- 0 until 5) assert(g.degree(v) == 4)
  }

  test("cycle, path, star shapes") {
    val c = LocalGraph.cycle(6)
    assert(c.m == 6 && c.maxDegree == 2)
    val p = LocalGraph.path(6)
    assert(p.m == 5 && p.degree(0) == 1 && p.degree(3) == 2)
    val s = LocalGraph.star(6)
    assert(s.m == 5 && s.degree(0) == 5 && s.degree(1) == 1)
  }

  test("edgeList emits each undirected edge once, u < v") {
    val g = LocalGraph.fromEdges(5, Seq((0, 1), (3, 2), (4, 1)))
    assert(g.edgeList.toSeq.sorted == Seq((0, 1), (1, 4), (2, 3)))
  }

  test("edgeListDirected on an oriented graph matches orientation") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2), (2, 3), (0, 3)))
    val rank = Array(0, 1, 2, 3)
    val o = g.orient(rank)
    assert(o.edgeListDirected.toSeq.sorted == Seq((0, 1), (0, 3), (1, 2), (2, 3)))
  }

  test("orient keeps exactly one direction per edge") {
    val rnd = new Random(11)
    val g = GraphGen.erLocal(30, 0.3, 3)
    val rank = rnd.shuffle((0 until 30).toList).toArray
    val o = g.orient(rank)
    assert(o.adj.length == g.m)
    o.edgeListDirected.foreach { case (u, v) =>
      assert(rank(u) < rank(v))
      assert(g.hasEdge(u, v))
    }
  }

  test("orient under degeneracy order bounds out-degree by degeneracy") {
    val g = GraphGen.erLocal(60, 0.15, 4)
    val (rank, _, d) = Reorder.degeneracyLocal(g)
    val o = g.orient(rank)
    assert(o.maxDegree <= d)
  }

  test("inducedSubgraph of K5 on 3 vertices is K3") {
    val g = LocalGraph.complete(5)
    val (h, ids) = g.inducedSubgraph(Array(1, 3, 4))
    assert(h.n == 3 && h.m == 3)
    assert(ids.toSeq == Seq(1, 3, 4))
    assert(h.neighbors(0).toSeq == Seq(1, 2))
  }

  test("inducedSubgraph preserves exactly the internal edges") {
    val g = GraphGen.erLocal(40, 0.2, 5)
    val verts = Array(2, 5, 7, 11, 13, 20, 33)
    val (h, ids) = g.inducedSubgraph(verts)
    for (i <- verts.indices; j <- verts.indices if i != j) {
      assert(h.hasEdge(i, j) == g.hasEdge(ids(i), ids(j)))
    }
  }

  test("neighborhoods materialise per set representation") {
    val g = LocalGraph.complete(4)
    for (f <- SetFactory.all) {
      val nbh = g.neighborhoods(f)
      assert(nbh(0).toArray.toSeq == Seq(1, 2, 3))
      assert(nbh(2).toArray.toSeq == Seq(0, 1, 3))
    }
  }

  test("empty / edgeless graphs behave") {
    val g = LocalGraph.fromEdges(3, Seq.empty)
    assert(g.n == 3 && g.m == 0 && g.maxDegree == 0)
    assert(g.neighbors(1).isEmpty)
  }

  test("csrBytes grows with graph size") {
    val small = LocalGraph.complete(4)
    val big = LocalGraph.complete(20)
    assert(big.csrBytes > small.csrBytes)
  }
}
