package repro.patterns

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.CliqueCore

/** Appendix-D optimized star / diamond decompositions must be
  * output-equivalent to the generic instance-materializing peel.
  */
class SpecialCoresSpec extends AnyFunSuite {

  for (seed <- 1 to 8; x <- Seq(2, 3)) {
    test(s"$x-star optimized decomposition matches the generic peel (seed=$seed)") {
      val g = TestUtil.randomGraph(25, 0.25, seed)
      val a = SpecialCores.decomposeStar(g, x)
      val b = CliqueCore.decompose(g, Pattern.Star(x))
      assert(a.core.toSeq == b.core.toSeq)
      assert(a.totalInstances == b.totalInstances)
      assert(math.abs(a.bestDensity - b.bestDensity) < 1e-9)
    }
  }

  for (seed <- 1 to 8) {
    test(s"diamond optimized decomposition matches the generic peel (seed=$seed)") {
      val g = TestUtil.randomGraph(18, 0.35, seed)
      val a = SpecialCores.decomposeDiamond(g)
      val b = CliqueCore.decompose(g, Pattern.Diamond)
      assert(a.core.toSeq == b.core.toSeq)
      assert(a.totalInstances == b.totalInstances)
      assert(math.abs(a.bestDensity - b.bestDensity) < 1e-9)
    }
  }

  test("star decomposition on a pure star: center and leaves share core k") {
    // K1,5 with x=2: every vertex lies in some 2-star; peeling a leaf
    // removes C(4,1)=4 instances, etc. Just check agreement + sane kMax.
    val g = TestUtil.star(5)
    val a = SpecialCores.decomposeStar(g, 2)
    val b = CliqueCore.decompose(g, Pattern.Star(2))
    assert(a.core.toSeq == b.core.toSeq)
    assert(a.kMax == b.kMax)
  }

  test("diamond decomposition of K5: every vertex has C4-core 9") {
    // K5 contains 3*C(5,4)=15 C4s; each vertex lies in 3*C(4,3)... check
    // against the generic peel rather than hand-derived numbers.
    val g = TestUtil.complete(5)
    val a = SpecialCores.decomposeDiamond(g)
    val b = CliqueCore.decompose(g, Pattern.Diamond)
    assert(a.core.toSeq == b.core.toSeq)
  }

  test("empty graphs") {
    val g = repro.graph.LocalGraph.fromEdges(Nil)
    assert(SpecialCores.decomposeStar(g, 2).core.isEmpty)
    assert(SpecialCores.decomposeDiamond(g).core.isEmpty)
  }

  test("triangle-free path: star cores positive, diamond cores zero") {
    val g = TestUtil.path(6)
    val s = SpecialCores.decomposeStar(g, 2)
    assert(s.totalInstances == 4) // one 2-star per internal vertex
    val d = SpecialCores.decomposeDiamond(g)
    assert(d.totalInstances == 0)
    assert(d.core.forall(_ == 0))
  }
}
