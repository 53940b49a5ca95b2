package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.LocalGraph
import repro.patterns.Pattern

class CliqueCoreSpec extends AnyFunSuite {

  test("K4 with Ψ=triangle: all clique-core numbers are 3 (paper Example 3)") {
    val dec = CliqueCore.decompose(TestUtil.complete(4), Pattern.Triangle)
    assert(dec.core.forall(_ == 3))
    assert(dec.kMax == 3)
  }

  test("triangle graph with Ψ=triangle: core numbers 1") {
    val dec = CliqueCore.decompose(TestUtil.cycle(3), Pattern.Triangle)
    assert(dec.core.forall(_ == 1))
  }

  test("path with Ψ=triangle: all zero") {
    val dec = CliqueCore.decompose(TestUtil.path(5), Pattern.Triangle)
    assert(dec.core.forall(_ == 0))
    assert(dec.totalInstances == 0)
  }

  test("Ψ=edge reduces to classical k-core numbers") {
    for (seed <- 1 to 5) {
      val g = TestUtil.randomGraph(25, 0.3, seed)
      val a = CliqueCore.decompose(g, Pattern.Edge).core.map(_.toInt).toSeq
      val b = KCore.decompose(g).core.toSeq
      assert(a == b, s"seed=$seed")
    }
  }

  test("core number never exceeds clique-degree (property 3)") {
    val g   = TestUtil.randomGraph(20, 0.4, 3)
    val deg = Pattern.Triangle.degrees(g)
    val dec = CliqueCore.decompose(g, Pattern.Triangle)
    (0 until g.n).foreach(v => assert(dec.core(v) <= deg(v)))
  }

  for (seed <- 1 to 6; (p, nm) <- Seq((Pattern.Triangle, "triangle"), (Pattern.Clique(4), "4-clique"),
                                       (Pattern.Star(2), "2-star"), (Pattern.Diamond, "diamond"))) {
    test(s"($nm, seed=$seed) every (k,Ψ)-core matches the definitional fixpoint") {
      val g   = TestUtil.randomGraph(13, 0.45, seed)
      val dec = CliqueCore.decompose(g, p)
      for (k <- 0L to math.min(dec.kMax + 1, 12L))
        assert(dec.coreVertices(k).toSet == TestUtil.bruteCoreVertices(g, p, k),
               s"k=$k kMax=${dec.kMax}")
    }
  }

  test("(k,Ψ)-cores are nested") {
    val g   = TestUtil.randomGraph(20, 0.4, 8)
    val dec = CliqueCore.decompose(g, Pattern.Triangle)
    for (k <- 1L to dec.kMax)
      assert(dec.coreVertices(k).toSet.subsetOf(dec.coreVertices(k - 1).toSet))
  }

  test("Theorem 1: density of every (k,Ψ)-core lies in [k/|V_Ψ|, k_max]") {
    for (seed <- 1 to 5) {
      val g    = TestUtil.randomGraph(18, 0.4, seed)
      val psi  = Pattern.Triangle
      val inst = psi.instances(g)
      val dec  = CliqueCore.decomposeInstances(g.n, inst)
      if (dec.totalInstances > 0) {
        for (k <- 1L to dec.kMax) {
          val vs = dec.coreVertices(k)
          if (vs.nonEmpty) {
            val rho = Densest.countWithin(inst, g.n, vs).toDouble / vs.length
            assert(rho >= k.toDouble / psi.numVertices - 1e-9, s"k=$k lower")
            assert(rho <= dec.kMax + 1e-9, s"k=$k upper")
          }
        }
      }
    }
  }

  test("bestDensity matches the best residual density (PeelApp invariant)") {
    val g    = TestUtil.randomGraph(16, 0.45, 4)
    val psi  = Pattern.Triangle
    val inst = psi.instances(g)
    val dec  = CliqueCore.decomposeInstances(g.n, inst)
    val s    = dec.bestResidualVertices
    val rho  = Densest.countWithin(inst, g.n, s).toDouble / s.length
    assert(math.abs(rho - dec.bestDensity) < 1e-9)
    // bestDensity is a lower bound on rho_opt and at least the graph density
    assert(dec.bestDensity + 1e-9 >= dec.totalInstances.toDouble / g.n)
  }

  test("NucleusAND computes identical clique-core numbers") {
    for (seed <- 1 to 6; p <- Seq(Pattern.Triangle, Pattern.Clique(4), Pattern.Edge)) {
      val g = TestUtil.randomGraph(16, 0.4, seed)
      val a = CliqueCore.decompose(g, p).core.toSeq
      val b = NucleusAND.coreNumbers(g, p).toSeq
      assert(a == b, s"seed=$seed psi=$p")
    }
  }

  test("NucleusAND h-index helper") {
    assert(NucleusAND.hIndex(Array(3L, 3L, 3L)) == 3)
    assert(NucleusAND.hIndex(Array(5L, 1L)) == 1)
    assert(NucleusAND.hIndex(Array.empty[Long]) == 0)
    assert(NucleusAND.hIndex(Array(10L, 9L, 8L, 2L)) == 3)
  }

  test("decomposition of empty graph") {
    val dec = CliqueCore.decomposeInstances(0, Array.empty)
    assert(dec.core.isEmpty && dec.kMax == 0)
  }

  test("figure5 (Ψ=edge): kMax=4 and the 4-core is the K5") {
    val g   = repro.data.SynthGraphs.figure5
    val dec = CliqueCore.decompose(g, Pattern.Edge)
    assert(dec.kMax == 4)
    assert(dec.kMaxCoreVertices.map(g.ids).toSet == Set(7L, 8L, 9L, 10L, 11L))
    // Pruning-1 bound from Example 5: rho' >= 25/12
    assert(dec.bestDensity >= 25.0 / 12 - 1e-9)
  }
}
