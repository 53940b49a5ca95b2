package repro.flow

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.patterns.Pattern

class DensestFlowSpec extends AnyFunSuite {

  test("group collapses instances sharing a vertex set") {
    val inst = IndexedSeq(Array(0, 1, 2, 3), Array(0, 1, 2, 3), Array(1, 2, 3, 4))
    val gs = DensestFlow.group(inst)
    assert(gs.length == 2)
    assert(gs.find(_.verts.sameElements(Array(0, 1, 2, 3))).get.mult == 2)
    assert(gs.find(_.verts.sameElements(Array(1, 2, 3, 4))).get.mult == 1)
  }

  test("ungrouped keeps every instance separate") {
    val inst = IndexedSeq(Array(0, 1, 2), Array(0, 1, 2))
    assert(DensestFlow.ungrouped(inst).length == 2)
    assert(DensestFlow.ungrouped(inst).forall(_.mult == 1))
  }

  test("denserThan finds a denser-than-alpha subgraph when one exists (edge density)") {
    // K4 (density 1.5) plus a pendant: probing alpha=1 must return something
    val g = repro.graph.LocalGraph.fromEdges(
      Seq((0L, 1L), (0L, 2L), (0L, 3L), (1L, 2L), (1L, 3L), (2L, 3L), (3L, 4L)))
    val inst = Pattern.Edge.instances(g)
    val s = DensestFlow.denserThan(g.n, DensestFlow.ungrouped(inst), 2, 1.0)
    assert(s.nonEmpty)
    // the returned set must itself be denser than alpha
    val mu = inst.count(i => i.forall(s.contains))
    assert(mu.toDouble / s.length > 1.0)
  }

  test("denserThan returns empty above the optimum") {
    val g    = TestUtil.complete(4) // rho_opt = 1.5
    val inst = Pattern.Edge.instances(g)
    val s = DensestFlow.denserThan(g.n, DensestFlow.ungrouped(inst), 2, 1.6)
    assert(s.isEmpty)
  }

  test("denserThan at exactly the optimum returns empty (strict inequality)") {
    val g    = TestUtil.complete(4)
    val inst = Pattern.Edge.instances(g)
    val s = DensestFlow.denserThan(g.n, DensestFlow.ungrouped(inst), 2, 1.5)
    assert(s.isEmpty)
  }

  test("triangle network: K4 probe below optimum returns the K4") {
    val g    = TestUtil.complete(4) // 4 triangles / 4 vertices = 1.0
    val inst = Pattern.Triangle.instances(g)
    val s = DensestFlow.denserThan(g.n, DensestFlow.ungrouped(inst), 3, 0.9)
    assert(s.sorted.sameElements(Array(0, 1, 2, 3)))
  }

  // Lemma 12: grouped (construct+) and ungrouped networks have equal min-cuts.
  for (seed <- 1 to 5; (p, nm) <- Seq((Pattern.Diamond, "diamond"), (Pattern.Star(2), "2-star"))) {
    test(s"Lemma 12 ($nm, seed=$seed): construct+ preserves the min-cut capacity") {
      val g    = TestUtil.randomGraph(9, 0.5, seed)
      val inst = p.instances(g)
      if (inst.nonEmpty) {
        val h = p.numVertices
        for (alpha <- Seq(0.3, 0.9, 1.7)) {
          val a = DensestFlow.minCutValue(g.n, DensestFlow.ungrouped(inst), h, alpha)
          val b = DensestFlow.minCutValue(g.n, DensestFlow.group(inst), h, alpha)
          assert(math.abs(a - b) < 1e-6, s"alpha=$alpha: $a vs $b")
        }
      }
    }
  }

  test("Lemma 8 pruning never changes probe outcomes") {
    for (seed <- 1 to 5) {
      val g    = TestUtil.randomGraph(10, 0.4, seed)
      val inst = Pattern.Triangle.instances(g)
      if (inst.nonEmpty) {
        val full   = DensestFlow.group(inst)
        val pruned = DensestFlow.pruneLemma8(g.n, full, 3)
        for (alpha <- Seq(0.2, 0.6, 1.1)) {
          val a = DensestFlow.denserThan(g.n, full, 3, alpha)
          val b = DensestFlow.denserThan(g.n, pruned, 3, alpha)
          // outcomes must agree on emptiness; nonempty answers must be valid
          assert(a.isEmpty == b.isEmpty, s"seed=$seed alpha=$alpha")
          if (b.nonEmpty) {
            val mu = inst.count(i => i.forall(b.contains))
            assert(mu.toDouble / b.length > alpha)
          }
        }
      }
    }
  }

  test("pruneLemma8 retains everything when nothing is prunable (clique)") {
    val inst = Pattern.Triangle.instances(TestUtil.complete(5))
    val gs   = DensestFlow.group(inst)
    assert(DensestFlow.pruneLemma8(5, gs, 3).length == gs.length)
  }
}
