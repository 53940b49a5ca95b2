package repro

import repro.graph.LocalGraph
import repro.patterns.Pattern
import scala.collection.mutable
import scala.util.Random

/** Shared helpers for the test suites. */
object TestUtil {

  /** Deterministic G(n, p) random graph. */
  def randomGraph(n: Int, p: Double, seed: Long): LocalGraph = {
    val rnd   = new Random(seed)
    val edges = mutable.ArrayBuffer.empty[(Long, Long)]
    for (u <- 0 until n; v <- (u + 1) until n if rnd.nextDouble() < p)
      edges += ((u.toLong, v.toLong))
    LocalGraph.fromEdges(edges, (0L until n.toLong))
  }

  /** Complete graph K_n. */
  def complete(n: Int): LocalGraph =
    LocalGraph.fromEdges(for (u <- 0 until n; v <- (u + 1) until n)
      yield (u.toLong, v.toLong))

  /** Path graph P_n (n vertices, n-1 edges). */
  def path(n: Int): LocalGraph =
    LocalGraph.fromEdges((0 until n - 1).map(i => (i.toLong, (i + 1).toLong)))

  /** Cycle C_n. */
  def cycle(n: Int): LocalGraph =
    LocalGraph.fromEdges((0 until n).map(i => (i.toLong, ((i + 1) % n).toLong)))

  /** Star with `tails` leaves (center = 0). */
  def star(tails: Int): LocalGraph =
    LocalGraph.fromEdges((1 to tails).map(i => (0L, i.toLong)))

  /** Reference (k, Ψ)-core by definition: iteratively delete vertices whose
    * Ψ-degree (recomputed on the induced residual) is below k, to fixpoint.
    * Returns surviving local ids of `g`.
    */
  def bruteCoreVertices(g: LocalGraph, psi: Pattern, k: Long): Set[Int] = {
    var keep = (0 until g.n).toSet
    var changed = true
    while (changed && keep.nonEmpty) {
      val sub  = g.induced(keep)
      val deg  = psi.degrees(sub)
      val bad  = sub.ids.indices.filter(i => deg(i) < k).map(i => sub.ids(i)).toSet
      if (bad.isEmpty) changed = false
      else {
        // sub.ids are g's external ids; map back to g-local ids
        val extToLocal = (0 until g.n).map(v => g.ids(v) -> v).toMap
        keep = keep -- bad.map(extToLocal)
      }
    }
    keep
  }
}
