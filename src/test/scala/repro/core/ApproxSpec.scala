package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.data.SynthGraphs
import repro.patterns.Pattern

class ApproxSpec extends AnyFunSuite {

  val patterns: Seq[(Pattern, String)] = Seq(
    (Pattern.Edge, "edge"), (Pattern.Triangle, "triangle"),
    (Pattern.Clique(4), "4-clique"), (Pattern.Star(2), "2-star"), (Pattern.Diamond, "diamond"))

  // ---- PeelApp ----

  for (seed <- 1 to 5; (p, nm) <- patterns) {
    test(s"PeelApp achieves >= 1/|V_Ψ| of the optimum (seed=$seed, Ψ=$nm)") {
      val g   = TestUtil.randomGraph(12, 0.45, seed)
      val opt = Densest.bruteForce(g, p).density
      val r   = PeelApp.run(g, p)
      assert(r.density + 1e-9 >= opt / p.numVertices,
        s"peel=${r.density} opt=$opt h=${p.numVertices}")
      // and never better than the optimum
      assert(r.density <= opt + 1e-9)
    }
  }

  test("PeelApp on K5 returns the whole clique") {
    val r = PeelApp.run(TestUtil.complete(5), Pattern.Edge)
    assert(r.size == 5 && math.abs(r.density - 2.0) < 1e-9)
  }

  test("PeelApp with no instances returns density 0") {
    assert(PeelApp.run(TestUtil.path(5), Pattern.Triangle).density == 0.0)
  }

  // ---- IncApp ----

  for (seed <- 1 to 5; (p, nm) <- Seq((Pattern.Triangle, "triangle"), (Pattern.Diamond, "diamond"))) {
    test(s"IncApp returns the (k_max,Ψ)-core with the ratio guarantee (seed=$seed, Ψ=$nm)") {
      val g   = TestUtil.randomGraph(12, 0.5, seed)
      val inst = p.instances(g)
      if (inst.nonEmpty) {
        val opt = Densest.bruteForce(g, p).density
        val r   = IncApp.run(g, p)
        assert(r.density + 1e-9 >= opt / p.numVertices)
        // the returned set must be the definitional (k_max, Ψ)-core
        val dec = CliqueCore.decomposeInstances(g.n, inst)
        assert(r.vertices.toSet == TestUtil.bruteCoreVertices(g, p, dec.kMax))
      }
    }
  }

  test("IncApp on figure5 (Ψ=edge) returns the K5, not the EDS") {
    val g = SynthGraphs.figure5
    val r = IncApp.run(g, Pattern.Edge)
    assert(r.externalIds(g).toSet == Set(7L, 8L, 9L, 10L, 11L))
    assert(math.abs(r.density - 2.0) < 1e-9) // < 15/7: approximation, not exact
  }

  // ---- CoreApp ----

  for (seed <- 1 to 6; (p, nm) <- Seq((Pattern.Edge, "edge"), (Pattern.Triangle, "triangle"),
                                       (Pattern.Clique(4), "4-clique"), (Pattern.Star(2), "2-star"),
                                       (Pattern.Diamond, "diamond"))) {
    test(s"CoreApp finds the same (k_max, core) as IncApp (seed=$seed, Ψ=$nm)") {
      val g = TestUtil.randomGraph(20, 0.35, seed)
      val dec = CliqueCore.decompose(g, p)
      val (kMax, vs, mu) = CoreApp.kMaxCore(g, p)
      assert(kMax == dec.kMax, s"kMax: $kMax vs ${dec.kMax}")
      if (dec.totalInstances > 0) {
        assert(vs.toSet == dec.kMaxCoreVertices.toSet)
        val inst = p.instances(g)
        assert(mu == Densest.countWithin(inst, g.n, vs))
      }
    }
  }

  test("CoreApp gamma bounds dominate the clique-core numbers") {
    for (seed <- 1 to 4; p <- Seq(Pattern.Triangle, Pattern.Clique(4))) {
      val g   = TestUtil.randomGraph(18, 0.4, seed)
      val gam = CoreApp.gamma(g, p)
      val dec = CliqueCore.decompose(g, p)
      (0 until g.n).foreach(v => assert(gam(v) >= dec.core(v), s"v=$v seed=$seed p=$p"))
    }
  }

  test("CoreApp on a planted clique returns the clique as k_max-core") {
    val base = SynthGraphs.powerLaw(400, 900, 2.5, 9)
    val g    = SynthGraphs.plantClique(base, 14, 9)
    val (kMax, vs, _) = CoreApp.kMaxCore(g, Pattern.Triangle)
    assert(kMax >= repro.patterns.Combinatorics.choose(13, 2)) // C(13,2)=78 triangles each
    assert(vs.length >= 14 && vs.length <= 20)
  }

  // ---- EMcore ----

  for (seed <- 1 to 5) {
    test(s"EMcore returns the classical k_max-core (seed=$seed)") {
      val g   = TestUtil.randomGraph(40, 0.25, seed)
      val dec = KCore.decompose(g)
      val (kMax, vs) = EMcore.kMaxCore(g)
      assert(kMax == dec.kMax)
      assert(vs.toSet == dec.coreVertices(dec.kMax).toSet)
    }
  }

  test("EMcore and CoreApp(edge) agree on the stand-ins") {
    val g = SynthGraphs.standIn("Netscience").g
    val (k1, v1) = EMcore.kMaxCore(g)
    val (k2, v2, _) = CoreApp.kMaxCore(g, Pattern.Edge)
    assert(k1.toLong == k2)
    assert(v1.toSet == v2.toSet)
  }

  // ---- NucleusAND as an approximation algorithm ----

  test("NucleusAND.run returns the same core as IncApp") {
    for (seed <- 1 to 3) {
      val g = TestUtil.randomGraph(15, 0.45, seed)
      val a = NucleusAND.run(g, Pattern.Triangle)
      val b = IncApp.run(g, Pattern.Triangle)
      assert(a.vertices.toSet == b.vertices.toSet, s"seed=$seed")
      assert(math.abs(a.density - b.density) < 1e-9)
    }
  }

  // ---- cross-algorithm ordering (the paper's accuracy story) ----

  test("approximation ratios: exact >= PeelApp, exact >= IncApp, all >= 1/h") {
    for (seed <- 1 to 4) {
      val g   = TestUtil.randomGraph(14, 0.4, seed)
      val psi = Pattern.Triangle
      if (psi.count(g) > 0) {
        val opt  = CoreExact.run(g, psi).density
        val peel = PeelApp.run(g, psi).density
        val inc  = IncApp.run(g, psi).density
        assert(peel <= opt + 1e-9 && inc <= opt + 1e-9)
        assert(peel + 1e-9 >= opt / 3 && inc + 1e-9 >= opt / 3)
      }
    }
  }
}
