package repro.core

import repro.graph.LocalGraph
import repro.patterns.Pattern
import scala.collection.mutable

/** (k, Ψ)-core decomposition (Algorithm 3), generalized to any pattern.
  *
  * Instances of Ψ are materialized once and indexed per vertex; peeling the
  * minimum-clique-degree vertex kills its live instances and decrements the
  * other members — output-identical to the paper's re-enumeration variant
  * with the same worst-case complexity (see DESIGN.md "Deviations").
  *
  * The peel also records, for every prefix of removals, the density of the
  * residual graph — this yields ρ' for CoreExact's Pruning 1 and the best
  * residual subgraph S* for PeelApp at no extra asymptotic cost.
  */
object CliqueCore {

  /** Decomposition output.
    *
    * @param core          clique-core number per local vertex id
    * @param order         vertices in peel (removal) order
    * @param totalInstances μ(G, Ψ)
    * @param bestDensity   ρ': max Ψ-density over all residual subgraphs
    * @param bestSuffix    index into `order` such that order[bestSuffix..] is
    *                      the densest residual subgraph (PeelApp's S*)
    */
  final case class Result(core: Array[Long],
                          order: Array[Int],
                          totalInstances: Long,
                          bestDensity: Double,
                          bestSuffix: Int) {
    def kMax: Long = if (core.isEmpty) 0L else core.max

    /** Vertices (local ids) of the (k, Ψ)-core. */
    def coreVertices(k: Long): Array[Int] = core.indices.filter(core(_) >= k).toArray

    /** Vertices of the (k_max, Ψ)-core. */
    def kMaxCoreVertices: Array[Int] = coreVertices(kMax)

    /** Vertices of the densest residual subgraph (PeelApp's S*). */
    def bestResidualVertices: Array[Int] = order.drop(bestSuffix)
  }

  /** Decompose `g` w.r.t. pattern `psi`. */
  def decompose(g: LocalGraph, psi: Pattern): Result =
    decomposeInstances(g.n, psi.instances(g))

  /** Decompose given pre-materialized instances (sorted local-id arrays). */
  def decomposeInstances(n: Int, instances: Array[Array[Int]]): Result = {
    if (n == 0) return Result(Array.empty, Array.empty, 0L, 0.0, 0)
    val deg = new Array[Long](n)
    instances.foreach { inst =>
      var i = 0
      while (i < inst.length) { deg(inst(i)) += 1; i += 1 }
    }
    // per-vertex instance index
    val counts = new Array[Int](n)
    instances.foreach(inst => inst.foreach(counts(_) += 1))
    val vertexInst = Array.tabulate(n)(v => new Array[Int](counts(v)))
    val fill = new Array[Int](n)
    var ii = 0
    while (ii < instances.length) {
      val inst = instances(ii)
      var i = 0
      while (i < inst.length) {
        val v = inst(i)
        vertexInst(v)(fill(v)) = ii; fill(v) += 1
        i += 1
      }
      ii += 1
    }

    val alive     = Array.fill(n)(true)
    val instAlive = Array.fill(instances.length)(true)
    val core      = new Array[Long](n)
    val order     = new Array[Int](n)
    // lazy-deletion min-heap over (degree, vertex)
    val pq = mutable.PriorityQueue.empty[(Long, Int)](Ordering.by[(Long, Int), Long](_._1).reverse)
    var v = 0
    while (v < n) { pq.enqueue((deg(v), v)); v += 1 }

    var k              = 0L
    var remainingInst  = instances.length.toLong
    var remainingVerts = n
    var bestDensity    = remainingInst.toDouble / remainingVerts // density of G itself
    var bestSuffix     = 0
    var removed        = 0

    while (removed < n) {
      var (d0, u) = pq.dequeue()
      while (!alive(u) || d0 != deg(u)) { val t = pq.dequeue(); d0 = t._1; u = t._2 }
      if (d0 > k) k = d0
      core(u) = k
      order(removed) = u
      alive(u) = false
      val insts = vertexInst(u)
      var i = 0
      while (i < insts.length) {
        val id = insts(i)
        if (instAlive(id)) {
          instAlive(id) = false
          remainingInst -= 1
          val inst = instances(id)
          var j = 0
          while (j < inst.length) {
            val w = inst(j)
            if (w != u && alive(w)) {
              deg(w) -= 1
              pq.enqueue((deg(w), w))
            }
            j += 1
          }
        }
        i += 1
      }
      removed += 1
      remainingVerts -= 1
      if (remainingVerts > 0) {
        val dens = remainingInst.toDouble / remainingVerts
        if (dens > bestDensity) { bestDensity = dens; bestSuffix = removed }
      }
    }
    Result(core, order, instances.length.toLong, bestDensity, bestSuffix)
  }
}
