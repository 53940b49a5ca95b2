package repro.flow

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class DinicSpec extends AnyFunSuite {

  test("single edge") {
    val d = new Dinic(2)
    d.addEdge(0, 1, 5.0)
    assert(d.maxFlow(0, 1) == 5.0)
  }

  test("two parallel paths") {
    val d = new Dinic(4)
    d.addEdge(0, 1, 3.0); d.addEdge(1, 3, 2.0)
    d.addEdge(0, 2, 4.0); d.addEdge(2, 3, 5.0)
    assert(d.maxFlow(0, 3) == 6.0)
  }

  test("classic CLRS-style network") {
    val d = new Dinic(6)
    d.addEdge(0, 1, 16); d.addEdge(0, 2, 13)
    d.addEdge(1, 3, 12); d.addEdge(2, 1, 4)
    d.addEdge(3, 2, 9); d.addEdge(2, 4, 14)
    d.addEdge(4, 3, 7); d.addEdge(3, 5, 20); d.addEdge(4, 5, 4)
    assert(d.maxFlow(0, 5) == 23.0)
  }

  test("disconnected sink gives zero flow and trivial cut") {
    val d = new Dinic(3)
    d.addEdge(0, 1, 9.0)
    assert(d.maxFlow(0, 2) == 0.0)
    val inS = d.minCutSourceSide(0)
    assert(inS(0) && inS(1) && !inS(2))
  }

  test("min-cut source side separates s from t with saturated frontier") {
    val d = new Dinic(5)
    d.addEdge(0, 1, 1.0); d.addEdge(0, 2, 1.0)
    d.addEdge(1, 3, 0.5); d.addEdge(2, 3, 2.0); d.addEdge(3, 4, 2.0)
    val f = d.maxFlow(0, 4)
    assert(math.abs(f - 1.5) < 1e-9)
    val inS = d.minCutSourceSide(0)
    assert(inS(0) && !inS(4))
  }

  test("fractional capacities are handled exactly enough") {
    val d = new Dinic(4)
    d.addEdge(0, 1, 0.3); d.addEdge(0, 2, 0.7)
    d.addEdge(1, 3, 1.0); d.addEdge(2, 3, 0.5)
    assert(math.abs(d.maxFlow(0, 3) - 0.8) < 1e-9)
  }

  // brute-force min-cut on tiny random networks: enumerate all S subsets
  private def bruteMinCut(n: Int, edges: Seq[(Int, Int, Double)], s: Int, t: Int): Double = {
    var best = Double.MaxValue
    for (bits <- 0 until (1 << n) if (bits & (1 << s)) != 0 && (bits & (1 << t)) == 0) {
      val cut = edges.collect {
        case (u, v, c) if (bits & (1 << u)) != 0 && (bits & (1 << v)) == 0 => c
      }.sum
      best = math.min(best, cut)
    }
    best
  }

  for (seed <- 1 to 10) {
    test(s"random network seed=$seed: max-flow equals brute-force min-cut") {
      val rnd = new Random(seed)
      val n   = 7
      val edges = for {
        u <- 0 until n; v <- 0 until n
        if u != v && rnd.nextDouble() < 0.4
      } yield (u, v, math.rint(rnd.nextDouble() * 10) / 2.0)
      val d = new Dinic(n)
      edges.foreach { case (u, v, c) => d.addEdge(u, v, c) }
      val f = d.maxFlow(0, n - 1)
      assert(math.abs(f - bruteMinCut(n, edges, 0, n - 1)) < 1e-9)
    }
  }
}
