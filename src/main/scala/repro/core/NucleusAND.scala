package repro.core

import repro.graph.LocalGraph
import repro.patterns.Pattern

/** Nucleus-decomposition baseline: the AND-style local algorithm of
  * Sariyüce, Seshadhri & Pinar (PVLDB'18) specialized to (1, h)-nuclei,
  * which coincide with (k, Ψ)-cores for h-clique Ψ (Section 5.4).
  *
  * Each vertex starts at its Ψ-degree; one asynchronous sweep updates v to
  * the h-index of { min over the OTHER members' current values, per instance
  * containing v }. Sweeps repeat until a fixpoint — which is exactly the
  * clique-core number of every vertex. Run on a single core, as the paper
  * does for fair comparison.
  */
object NucleusAND {

  /** Clique/pattern-core numbers via asynchronous local h-index iteration. */
  def coreNumbers(g: LocalGraph, psi: Pattern): Array[Long] =
    coreNumbersFromInstances(g.n, psi.instances(g))

  def coreNumbersFromInstances(n: Int, instances: Array[Array[Int]]): Array[Long] = {
    val est = new Array[Long](n)
    instances.foreach(_.foreach(v => est(v) += 1)) // start at Ψ-degree

    // per-vertex instance index
    val counts = new Array[Int](n)
    instances.foreach(_.foreach(counts(_) += 1))
    val idx  = Array.tabulate(n)(v => new Array[Int](counts(v)))
    val fill = new Array[Int](n)
    for (i <- instances.indices; v <- instances(i)) { idx(v)(fill(v)) = i; fill(v) += 1 }

    var changed = true
    while (changed) {
      changed = false
      var v = 0
      while (v < n) {
        val mine = idx(v)
        if (mine.nonEmpty) {
          val vals = new Array[Long](mine.length)
          var i = 0
          while (i < mine.length) {
            val inst = instances(mine(i))
            var mn   = Long.MaxValue
            var j    = 0
            while (j < inst.length) {
              val u = inst(j)
              if (u != v && est(u) < mn) mn = est(u)
              j += 1
            }
            vals(i) = if (mn == Long.MaxValue) est(v) else mn
            i += 1
          }
          val h = hIndex(vals)
          if (h < est(v)) { est(v) = h; changed = true }
        }
        v += 1
      }
    }
    est
  }

  /** h-index of a multiset: max k with at least k values >= k. */
  def hIndex(vals: Array[Long]): Long = {
    val sorted = vals.sorted(Ordering.Long.reverse)
    var h = 0L
    var i = 0
    while (i < sorted.length && sorted(i) >= i + 1) { h = i + 1; i += 1 }
    h
  }

  /** The (k_max, Ψ)-core computed via the nucleus route. */
  def run(g: LocalGraph, psi: Pattern): Subgraph = {
    val instances = psi.instances(g)
    if (instances.isEmpty) return Subgraph(if (g.n > 0) Array(0) else Array.empty, 0L, 0.0)
    val core = coreNumbersFromInstances(g.n, instances)
    val kMax = core.max
    val vs   = core.indices.filter(core(_) >= kMax).toArray
    Densest.subgraphOf(instances, g.n, vs)
  }
}
