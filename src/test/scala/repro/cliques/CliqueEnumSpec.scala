package repro.cliques

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.LocalGraph
import repro.patterns.Combinatorics.choose

class CliqueEnumSpec extends AnyFunSuite {

  test("K6 clique counts match binomials for h = 2..6") {
    val g = TestUtil.complete(6)
    for (h <- 2 to 6)
      assert(CliqueEnum.count(g, h) == choose(6, h), s"h=$h")
  }

  test("h=1 counts vertices") {
    val g = TestUtil.path(5)
    assert(CliqueEnum.count(g, 1) == 5)
  }

  test("path has no triangles") {
    assert(CliqueEnum.count(TestUtil.path(10), 3) == 0)
  }

  test("cycle of length 3 is one triangle; longer cycles none") {
    assert(CliqueEnum.count(TestUtil.cycle(3), 3) == 1)
    assert(CliqueEnum.count(TestUtil.cycle(6), 3) == 0)
  }

  test("edge count equals m for h=2") {
    val g = TestUtil.randomGraph(40, 0.2, 1)
    assert(CliqueEnum.count(g, 2) == g.m)
  }

  test("two triangles sharing an edge (paper Fig 2a): counts and degrees") {
    // A-B-C triangle + A-C-D triangle sharing edge A-C (paper's example:
    // clique-degrees of A, B, C are 2, 1, 2)
    val g = LocalGraph.fromEdges(Seq((0L, 1L), (1L, 2L), (0L, 2L), (0L, 3L), (2L, 3L)))
    assert(CliqueEnum.count(g, 3) == 2)
    val deg = CliqueEnum.degrees(g, 3)
    assert(deg(0) == 2 && deg(2) == 2) // A and C
    assert(deg(1) == 1 && deg(3) == 1) // B and D
  }

  test("instances are sorted, distinct, and truly cliques") {
    val g    = TestUtil.randomGraph(30, 0.35, 5)
    val inst = CliqueEnum.instances(g, 4)
    assert(inst.forall(a => a.sorted.sameElements(a)))
    assert(inst.map(_.toSeq).distinct.length == inst.length)
    inst.foreach { a =>
      for (i <- a.indices; j <- (i + 1) until a.length)
        assert(g.hasEdge(a(i), a(j)))
    }
  }

  test("degrees sum to h * count") {
    val g = TestUtil.randomGraph(35, 0.3, 9)
    for (h <- 2 to 5) {
      val d = CliqueEnum.degrees(g, h)
      assert(d.sum == h * CliqueEnum.count(g, h), s"h=$h")
    }
  }

  // brute-force reference: enumerate all h-subsets of a small graph
  private def bruteCount(g: LocalGraph, h: Int): Long =
    (0 until g.n).combinations(h).count { s =>
      s.combinations(2).forall(p => g.hasEdge(p(0), p(1)))
    }

  for (seed <- 1 to 8; h <- 2 to 5) {
    test(s"random graph seed=$seed h=$h matches brute-force subset count") {
      val g = TestUtil.randomGraph(12, 0.45, seed)
      assert(CliqueEnum.count(g, h) == bruteCount(g, h))
    }
  }

  test("planted K8 in sparse noise is found for every h") {
    val base = TestUtil.randomGraph(60, 0.03, 2)
    val g = LocalGraph.fromEdges(
      base.edgesExternal ++ (for (i <- 0 until 8; j <- (i + 1) until 8)
        yield (i.toLong * 7, j.toLong * 7)))
    for (h <- 3 to 6)
      assert(CliqueEnum.count(g, h) >= choose(8, h), s"h=$h")
  }

  test("empty graph yields no cliques") {
    val g = LocalGraph.fromEdges(Nil)
    assert(CliqueEnum.count(g, 3) == 0)
  }
}
