package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.LocalGraph
import repro.patterns.Pattern

/** Section 6.3: the densest subgraph containing a set Q of query vertices. */
class QueryDensestSpec extends AnyFunSuite {

  test("query inside the densest subgraph returns the unconstrained optimum") {
    // K4 + pendant: Q = {0} (a clique member) -> the K4 itself
    val g = LocalGraph.fromEdges(
      Seq((0L, 1L), (0L, 2L), (0L, 3L), (1L, 2L), (1L, 3L), (2L, 3L), (3L, 4L)))
    val r = QueryDensest.run(g, Pattern.Edge, Set(0))
    assert(math.abs(r.density - 1.5) < 1e-9)
    assert(r.vertices.contains(0))
  }

  test("query outside the densest subgraph drags it in") {
    // K4 (0..3) + pendant 4 hanging off 3; Q = {4}: best is K4 + vertex 4
    val g = LocalGraph.fromEdges(
      Seq((0L, 1L), (0L, 2L), (0L, 3L), (1L, 2L), (1L, 3L), (2L, 3L), (3L, 4L)))
    val r  = QueryDensest.run(g, Pattern.Edge, Set(4))
    val bf = QueryDensest.bruteForce(g, Pattern.Edge, Set(4))
    assert(math.abs(r.density - bf.density) < 1e-9)
    assert(r.vertices.contains(4))
    assert(r.density < 1.5) // constrained optimum is worse than the EDS
  }

  for (seed <- 1 to 6; (p, nm) <- Seq((Pattern.Edge, "edge"), (Pattern.Triangle, "triangle"))) {
    test(s"matches brute force over Q-containing subsets (seed=$seed, Ψ=$nm)") {
      val g   = TestUtil.randomGraph(10, 0.4, seed)
      val q   = Set(seed % g.n, (3 * seed + 1) % g.n)
      val r   = QueryDensest.run(g, p, q)
      val bf  = QueryDensest.bruteForce(g, p, q)
      assert(math.abs(r.density - bf.density) < 1e-9,
        s"got ${r.density}, brute ${bf.density}")
      assert(q.subsetOf(r.vertices.toSet))
    }
  }

  test("lower bound: result density >= x/|V_Psi| (Section 6.3 bound)") {
    for (seed <- 10 to 13) {
      val g   = TestUtil.randomGraph(14, 0.35, seed)
      val psi = Pattern.Edge
      val dec = CliqueCore.decompose(g, psi)
      val q   = Set(seed % g.n)
      val x   = dec.core(q.head)
      val r   = QueryDensest.run(g, psi, q)
      assert(r.density + 1e-9 >= x.toDouble / psi.numVertices)
    }
  }

  test("query set spanning two components still returns a valid subgraph") {
    val g = LocalGraph.fromEdges(
      (for (i <- 0 until 4; j <- (i + 1) until 4) yield (i.toLong, j.toLong)) ++
      Seq((10L, 11L), (11L, 12L), (10L, 12L)))
    val local12 = g.ids.indexOf(12L)
    val r  = QueryDensest.run(g, Pattern.Edge, Set(0, local12))
    val bf = QueryDensest.bruteForce(g, Pattern.Edge, Set(0, local12))
    assert(math.abs(r.density - bf.density) < 1e-9)
  }

  test("graphs with no instances return the query set itself") {
    val g = TestUtil.path(5)
    val r = QueryDensest.run(g, Pattern.Triangle, Set(2))
    assert(r.density == 0.0)
    assert(r.vertices.contains(2))
  }
}
