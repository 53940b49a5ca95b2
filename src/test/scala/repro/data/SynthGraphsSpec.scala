package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.cliques.CliqueEnum
import repro.core.KCore

class SynthGraphsSpec extends AnyFunSuite {

  test("er is deterministic in (n, p, seed)") {
    val a = SynthGraphs.er(50, 0.1, 5)
    val b = SynthGraphs.er(50, 0.1, 5)
    assert(a.edgesExternal == b.edgesExternal)
  }

  test("er edge count is near expectation") {
    val g = SynthGraphs.er(200, 0.05, 1)
    val exp = 0.05 * 200 * 199 / 2
    assert(math.abs(g.m - exp) < 4 * math.sqrt(exp))
  }

  test("erM hits the requested edge count exactly") {
    val g = SynthGraphs.erM(100, 500, 2)
    assert(g.m == 500)
    assert(g.n == 100)
  }

  test("powerLaw produces requested sizes (approximately for m)") {
    val g = SynthGraphs.powerLaw(1000, 3000, 2.5, 3)
    assert(g.n == 1000)
    assert(g.m >= 2800 && g.m <= 3000)
  }

  test("powerLaw degrees are heavy-tailed") {
    val g = SynthGraphs.powerLaw(2000, 6000, 2.5, 4)
    val degs = (0 until g.n).map(g.degree)
    val mean = degs.sum.toDouble / g.n
    assert(degs.max > 8 * mean, s"max=${degs.max} mean=$mean")
  }

  test("powerLaw is deterministic") {
    val a = SynthGraphs.powerLaw(300, 900, 2.5, 9)
    val b = SynthGraphs.powerLaw(300, 900, 2.5, 9)
    assert(a.edgesExternal == b.edgesExternal)
  }

  test("ssca contains cliques (nontrivial max clique)") {
    val g = SynthGraphs.ssca(500, 12, 5)
    assert(CliqueEnum.count(g, 5) > 0)
  }

  test("rmat has the requested edge count and power-law-ish skew") {
    val g = SynthGraphs.rmat(10, 4000, 6)
    assert(g.m >= 3500)
    val degs = (0 until g.n).map(g.degree).filter(_ > 0)
    assert(degs.max > 5 * (degs.sum.toDouble / degs.length))
  }

  test("plantClique embeds a clique of the requested size") {
    val base = SynthGraphs.powerLaw(300, 600, 2.5, 7)
    val g    = SynthGraphs.plantClique(base, 15, 7)
    // a 15-clique forces classical k_max >= 14
    assert(KCore.kMax(g) >= 14)
    assert(CliqueEnum.count(g, 6) >= repro.patterns.Combinatorics.choose(15, 6))
  }

  test("figure5 matches the Example-5 spec") {
    val g = SynthGraphs.figure5
    assert(g.n == 15)
    // S1: 7 vertices 15 edges; S2: K5; tail: 2 edges + 2 anchors = 29 total
    assert(g.m == 29)
    val dec = KCore.decompose(g)
    assert(dec.kMax == 4)
    // the 4-core is exactly the K5 (external ids 7..11)
    val k4 = dec.coreVertices(4).map(g.ids).toSet
    assert(k4 == Set(7L, 8L, 9L, 10L, 11L))
    // the 3-core is S1 ∪ S2 (12 vertices, 25 edges) with density 25/12
    val s3 = g.induced(dec.coreVertices(3))
    assert(s3.n == 12 && s3.m == 25)
  }

  test("standIn sizes track the paper at the requested scale") {
    val s = SynthGraphs.standIn("Yeast")
    assert(s.paperN == 1116 && s.paperM == 2148)
    assert(s.g.n == 1116)
    assert(math.abs(s.g.m - 2148L) < 200)
  }

  test("standIn Netscience contains its 20-clique (k_max >= 19)") {
    val s = SynthGraphs.standIn("Netscience")
    assert(KCore.kMax(s.g) >= 19)
  }

  test("standIn S-DBLP contains its 13-clique") {
    val s = SynthGraphs.standIn("S-DBLP")
    assert(KCore.kMax(s.g) >= 12)
  }

  test("standIn scale shrinks large graphs") {
    val s = SynthGraphs.standIn("DBLP", 0.01)
    assert(s.g.n <= 5000)
    assert(s.paperN == 425957)
  }

  test("unknown stand-in names are rejected") {
    intercept[IllegalArgumentException](SynthGraphs.standIn("nope"))
  }

  test("toDF yields canonical src<dst rows") {
    val spark = repro.SparkSpec.shared
    val g  = SynthGraphs.er(30, 0.2, 8)
    val df = SynthGraphs.toDF(spark, g).collect()
    assert(df.length.toLong == g.m)
    assert(df.forall(r => r.getLong(0) < r.getLong(1)))
  }
}
