package repro.flow

import scala.collection.mutable

/** Dinic max-flow / min-st-cut over Double capacities.
  *
  * The paper's exact algorithms only need an exact min-st-cut oracle inside
  * the binary search (they use Gusfield's algorithm); Dinic is exact and
  * simple. Capacities here are O(cliqueDegree) with gaps no finer than
  * 1/(n(n-1)) between meaningful α values, far above double round-off.
  */
final class Dinic(val n: Int) {
  private val EPS = 1e-10

  private val head = Array.fill(n)(-1)
  private val next = new mutable.ArrayBuffer[Int]()
  private val to   = new mutable.ArrayBuffer[Int]()
  private val cap  = new mutable.ArrayBuffer[Double]()

  /** Add a directed edge u -> v with capacity c (reverse edge cap 0). */
  def addEdge(u: Int, v: Int, c: Double): Unit = {
    next += head(u); to += v; cap += c; head(u) = next.size - 1
    next += head(v); to += u; cap += 0.0; head(v) = next.size - 1
  }

  private val level = new Array[Int](n)
  private val iter  = new Array[Int](n)

  private def bfs(s: Int, t: Int): Boolean = {
    java.util.Arrays.fill(level, -1)
    val q = new mutable.ArrayDeque[Int]()
    level(s) = 0; q.append(s)
    while (q.nonEmpty) {
      val u = q.removeHead()
      var e = head(u)
      while (e >= 0) {
        if (cap(e) > EPS && level(to(e)) < 0) {
          level(to(e)) = level(u) + 1
          q.append(to(e))
        }
        e = next(e)
      }
    }
    level(t) >= 0
  }

  private def dfs(u: Int, t: Int, f: Double): Double = {
    if (u == t) return f
    var e = iter(u)
    while (e >= 0) {
      if (cap(e) > EPS && level(to(e)) == level(u) + 1) {
        val d = dfs(to(e), t, math.min(f, cap(e)))
        if (d > EPS) {
          cap(e) -= d
          cap(e ^ 1) += d
          iter(u) = e
          return d
        }
      }
      e = next(e)
      iter(u) = e
    }
    0.0
  }

  /** Run max flow from s to t; returns the flow value. */
  def maxFlow(s: Int, t: Int): Double = {
    var flow = 0.0
    while (bfs(s, t)) {
      var u = 0
      while (u < n) { iter(u) = head(u); u += 1 }
      var f = dfs(s, t, Double.MaxValue)
      while (f > EPS) { flow += f; f = dfs(s, t, Double.MaxValue) }
    }
    flow
  }

  /** After maxFlow: the source side S of a minimum st-cut (residual BFS). */
  def minCutSourceSide(s: Int): Array[Boolean] = {
    val inS = new Array[Boolean](n)
    val q   = new mutable.ArrayDeque[Int]()
    inS(s) = true; q.append(s)
    while (q.nonEmpty) {
      val u = q.removeHead()
      var e = head(u)
      while (e >= 0) {
        if (cap(e) > EPS && !inS(to(e))) { inS(to(e)) = true; q.append(to(e)) }
        e = next(e)
      }
    }
    inS
  }
}
