package repro.core

import repro.flow.DensestFlow
import repro.graph.LocalGraph
import repro.patterns.Pattern

/** The existing exact CDS/PDS algorithm (Algorithm 1, Goldberg/Tsourakakis).
  *
  * Binary search on the density guess α over [0, max clique-degree]; each
  * probe builds the flow network on the ENTIRE graph and computes a min
  * st-cut. No core-based pruning — this is the baseline CoreExact is
  * measured against. `grouped = true` switches the network to `construct+`
  * (Algorithm 7), which the paper applies to general patterns.
  */
object Exact {

  def run(g: LocalGraph, psi: Pattern, grouped: Boolean = false): Subgraph = {
    val n = g.n
    if (n == 0) return Subgraph(Array.empty, 0L, 0.0)
    val instances = psi.instances(g)
    if (instances.isEmpty) return Subgraph(Array(0), 0L, 0.0)
    val h = psi.numVertices
    val groups =
      if (grouped) DensestFlow.group(instances) else DensestFlow.ungrouped(instances)
    val deg = new Array[Long](n)
    instances.foreach(_.foreach(v => deg(v) += 1))

    var l = 0.0
    var u = deg.max.toDouble
    // seed with the whole graph so the result is defined even if every probe
    // at α >= ρ_opt fails (possible when ρ_opt = μ/n, i.e. G is its own CDS)
    var best = Subgraph((0 until n).toArray, instances.length.toLong,
                        instances.length.toDouble / n)
    val stop = 1.0 / (n.toLong * math.max(1L, n.toLong - 1L))
    while (u - l >= stop) {
      val alpha = (l + u) / 2
      val s     = DensestFlow.denserThan(n, groups, h, alpha)
      if (s.isEmpty) u = alpha
      else {
        l = alpha
        val cand = Densest.subgraphOf(instances, n, s)
        if (cand.density > best.density) best = cand
      }
    }
    best
  }
}
