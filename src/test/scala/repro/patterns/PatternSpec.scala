package repro.patterns

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.graph.LocalGraph
import repro.patterns.Combinatorics.choose

class PatternSpec extends AnyFunSuite {

  private val named: Seq[Pattern] = Seq(
    Pattern.Triangle, Pattern.Clique(4), Pattern.Star(2), Pattern.Star(3),
    Pattern.Diamond, Pattern.TwoTriangle, Pattern.Path4, Pattern.TailedTriangle)

  test("choose basics") {
    assert(choose(5, 2) == 10)
    assert(choose(5, 0) == 1)
    assert(choose(4, 5) == 0)
    assert(choose(-1, 2) == 0)
    assert(choose(52, 5) == 2598960L)
  }

  test("2-star count on a star graph is C(t, 2)") {
    for (t <- 2 to 6)
      assert(Pattern.Star(2).count(TestUtil.star(t)) == choose(t, 2), s"t=$t")
  }

  test("2-star instances on triangle: 3 (one per center)") {
    assert(Pattern.Star(2).instances(TestUtil.cycle(3)).length == 3)
  }

  test("star degrees: center and tail contributions (Eq. 25)") {
    val g = TestUtil.star(4) // center 0, leaves 1..4
    val d = Pattern.Star(2).degrees(g)
    assert(d(0) == choose(4, 2)) // center of C(4,2) stars
    assert(d(1) == choose(3, 1)) // tail of stars centered at 0 with 1 present
  }

  test("diamond (C4) count in K4 is 3") {
    assert(Pattern.Diamond.count(TestUtil.complete(4)) == 3)
    assert(Pattern.Diamond.instances(TestUtil.complete(4)).length == 3)
  }

  test("diamond count in C4 is 1, in C5 is 0") {
    assert(Pattern.Diamond.count(TestUtil.cycle(4)) == 1)
    assert(Pattern.Diamond.count(TestUtil.cycle(5)) == 0)
  }

  test("diamond degrees in K4: every vertex in all 3 cycles") {
    val d = Pattern.Diamond.degrees(TestUtil.complete(4))
    assert(d.forall(_ == 3))
  }

  test("2-triangle count in K4 is 6 (one per shared edge)") {
    assert(Pattern.TwoTriangle.count(TestUtil.complete(4)) == 6)
  }

  test("2-triangle in the bowtie-free diamond graph is 1") {
    // C4 + one chord = exactly one pair of triangles sharing the chord
    val g = LocalGraph.fromEdges(Seq((0L, 1L), (1L, 2L), (2L, 3L), (3L, 0L), (0L, 2L)))
    assert(Pattern.TwoTriangle.count(g) == 1)
  }

  test("4-path count in P4 is 1, in C4 is 4") {
    assert(Pattern.Path4.count(TestUtil.path(4)) == 1)
    assert(Pattern.Path4.count(TestUtil.cycle(4)) == 4)
  }

  test("tailed triangle count in K4 is 12 (non-induced: 4 triangles x 3 tails)") {
    assert(Pattern.TailedTriangle.count(TestUtil.complete(4)) == 12)
  }

  test("tailed triangle: triangle plus pendant") {
    val g = LocalGraph.fromEdges(Seq((0L, 1L), (1L, 2L), (0L, 2L), (2L, 3L)))
    assert(Pattern.TailedTriangle.count(g) == 1)
  }

  test("instance arrays are sorted vertex sets of the right size") {
    val g = TestUtil.randomGraph(15, 0.4, 3)
    named.foreach { p =>
      p.instances(g).foreach { a =>
        assert(a.length == p.numVertices, p.name)
        assert(a.sorted.sameElements(a), p.name)
        assert(a.distinct.length == a.length, p.name)
      }
    }
  }

  test("degrees sum equals numVertices * count for every named pattern") {
    val g = TestUtil.randomGraph(14, 0.45, 4)
    named.foreach { p =>
      val viaInst = {
        val d = new Array[Long](g.n)
        p.instances(g).foreach(_.foreach(v => d(v) += 1))
        d
      }
      assert(p.degrees(g).toSeq == viaInst.toSeq, s"${p.name}: closed-form vs instance degrees")
      assert(viaInst.sum == p.numVertices.toLong * p.instances(g).length, p.name)
    }
  }

  // Cross-check every specialized enumerator against the generic
  // subgraph-isomorphism enumerator (instances = distinct edge sets).
  for (seed <- 1 to 6; p <- named) {
    test(s"${p.name} matches generic enumerator on random graph seed=$seed") {
      val g   = TestUtil.randomGraph(10, 0.5, seed)
      val gen = Pattern.genericOf(p)
      val a   = p.instances(g).map(_.mkString(",")).sorted
      val b   = gen.instances(g).map(_.mkString(",")).sorted
      // counts must match exactly; multisets of vertex sets must match
      assert(a.length == b.length, s"${p.name}: ${a.length} vs ${b.length}")
      assert(a.sameElements(b))
    }
  }

  test("generic diamond on K4 also returns 3 instances") {
    assert(Pattern.genericOf(Pattern.Diamond).instances(TestUtil.complete(4)).length == 3)
  }

  test("generic clique agrees with CliqueEnum") {
    val g = TestUtil.randomGraph(12, 0.5, 11)
    for (h <- 3 to 5)
      assert(Pattern.genericOf(Pattern.Clique(h)).instances(g).length ==
             Pattern.Clique(h).count(g), s"h=$h")
  }

  test("byName resolves all documented names") {
    assert(Pattern.byName("edge") == Pattern.Edge)
    assert(Pattern.byName("triangle") == Pattern.Triangle)
    assert(Pattern.byName("2-star") == Pattern.Star(2))
    assert(Pattern.byName("c3-star") == Pattern.Star(3))
    assert(Pattern.byName("diamond") == Pattern.Diamond)
    assert(Pattern.byName("2-triangle") == Pattern.TwoTriangle)
    assert(Pattern.byName("6-clique") == Pattern.Clique(6))
    intercept[IllegalArgumentException](Pattern.byName("heptagon"))
  }

  test("pattern counts on empty and tiny graphs are zero") {
    val empty = LocalGraph.fromEdges(Nil)
    named.foreach(p => assert(p.count(empty) == 0, p.name))
    val single = LocalGraph.fromEdges(Seq((0L, 1L)))
    named.foreach(p => assert(p.count(single) == 0, p.name))
  }
}
