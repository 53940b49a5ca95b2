package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

class LocalGraphSpec extends AnyFunSuite {

  test("fromEdges deduplicates parallel and reversed edges") {
    val g = LocalGraph.fromEdges(Seq((1L, 2L), (2L, 1L), (1L, 2L), (2L, 3L)))
    assert(g.n == 3)
    assert(g.m == 2)
  }

  test("fromEdges drops self-loops") {
    val g = LocalGraph.fromEdges(Seq((1L, 1L), (1L, 2L)))
    assert(g.m == 1)
    assert(g.n == 2)
  }

  test("extraVertices adds isolated vertices") {
    val g = LocalGraph.fromEdges(Seq((1L, 2L)), Seq(7L, 8L))
    assert(g.n == 4)
    assert(g.degree(g.ids.indexOf(7L)) == 0)
  }

  test("degrees of K5 are all 4") {
    val g = TestUtil.complete(5)
    assert((0 until 5).forall(g.degree(_) == 4))
    assert(g.m == 10)
    assert(g.maxDegree == 4)
  }

  test("hasEdge agrees with adjacency") {
    val g = TestUtil.randomGraph(20, 0.3, 42)
    for (u <- 0 until g.n; v <- 0 until g.n if u != v)
      assert(g.hasEdge(u, v) == g.adj(u).contains(v), s"($u,$v)")
  }

  test("hasEdge is false on self pairs") {
    val g = TestUtil.complete(4)
    assert((0 until 4).forall(v => !g.hasEdge(v, v)))
  }

  test("edges iterator yields each edge once with u < v") {
    val g  = TestUtil.randomGraph(15, 0.4, 7)
    val es = g.edges.toSeq
    assert(es.size.toLong == g.m)
    assert(es.forall { case (u, v) => u < v })
    assert(es.distinct.size == es.size)
  }

  test("induced subgraph keeps internal edges only") {
    val g   = TestUtil.complete(6)
    val sub = g.induced(Seq(0, 1, 2))
    assert(sub.n == 3)
    assert(sub.m == 3)
  }

  test("induced subgraph preserves external ids") {
    val g   = LocalGraph.fromEdges(Seq((10L, 20L), (20L, 30L), (30L, 40L)))
    val sub = g.induced(Seq(1, 2)) // vertices 20 and 30
    assert(sub.ids.toSet == Set(20L, 30L))
    assert(sub.m == 1)
  }

  test("induced with duplicates in keep set is harmless") {
    val g   = TestUtil.complete(4)
    val sub = g.induced(Seq(0, 1, 1, 0, 2))
    assert(sub.n == 3 && sub.m == 3)
  }

  test("connected components: two triangles") {
    val g = LocalGraph.fromEdges(Seq((0L, 1L), (1L, 2L), (0L, 2L), (10L, 11L), (11L, 12L), (10L, 12L)))
    val comp = g.connectedComponents()
    assert(comp.distinct.length == 2)
    val sets = g.componentVertexSets()
    assert(sets.map(_.length).sorted == Seq(3, 3))
  }

  test("connected components: path is one component") {
    val g = TestUtil.path(10)
    assert(g.componentVertexSets().size == 1)
  }

  test("isolated vertices are their own components") {
    val g = LocalGraph.fromEdges(Seq((0L, 1L)), Seq(5L, 6L))
    assert(g.componentVertexSets().size == 3)
  }

  test("empty graph") {
    val g = LocalGraph.fromEdges(Nil)
    assert(g.n == 0 && g.m == 0 && g.maxDegree == 0)
    assert(g.componentVertexSets().isEmpty)
  }

  test("edgesExternal round-trips through fromEdges") {
    val g1 = TestUtil.randomGraph(25, 0.2, 3)
    val g2 = LocalGraph.fromEdges(g1.edgesExternal)
    assert(g2.m == g1.m)
    // vertex set may shrink if g1 had isolated vertices; edges must match
    assert(g2.edgesExternal.toSet == g1.edgesExternal.toSet)
  }
}
