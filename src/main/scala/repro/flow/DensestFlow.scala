package repro.flow

import scala.collection.mutable

/** Flow-network construction for the densest-subgraph binary search.
  *
  * Implements the Algorithm-1 network (one node per instance) and the
  * `construct+` network (Algorithm 7: one node per GROUP of instances
  * sharing a vertex set, edge capacities scaled by |g|) — by Lemma 12 both
  * have the same min-st-cut capacity, so the grouped form is used wherever
  * a flag does not force the baseline behaviour.
  *
  * Vertices here are dense ids 0..nVerts-1 of the (sub)graph the network is
  * built on; callers remap from LocalGraph ids.
  */
object DensestFlow {

  /** A group of pattern instances sharing one vertex set.
    *
    * @param verts sorted vertex ids (size = |V_Ψ|)
    * @param mult  |g|: how many distinct edge-set instances share `verts`
    *              (always 1 for cliques)
    */
  final case class Group(verts: Array[Int], mult: Int)

  /** Group raw instances by vertex set (construct+ line 2). */
  def group(instances: IndexedSeq[Array[Int]]): Array[Group] = {
    val m = mutable.LinkedHashMap.empty[mutable.ArraySeq[Int], Int]
    instances.foreach { inst =>
      val key = mutable.ArraySeq.make(inst)
      m.update(key, m.getOrElse(key, 0) + 1)
    }
    m.iterator.map { case (k, c) => Group(k.toArray, c) }.toArray
  }

  /** One group per instance — the ungrouped Algorithm-1 baseline network. */
  def ungrouped(instances: IndexedSeq[Array[Int]]): Array[Group] =
    instances.iterator.map(i => Group(i, 1)).toArray

  /** Conservative Lemma-8 pruning: drop a group's node when removing its
    * vertices provably INCREASES the density of the residual graph. We lower
    * bound μ(G') by μ(G) − Σ_{v∈ψ} deg(v, Ψ) (union bound), so everything
    * pruned here is pruned by Lemma 8; the flow network stays correct because
    * s→v capacities are recomputed from the retained groups (Appendix C.3).
    */
  def pruneLemma8(nVerts: Int, groups: Array[Group], h: Int): Array[Group] = {
    if (nVerts <= h) return groups
    val deg = new Array[Long](nVerts)
    var mu  = 0L
    groups.foreach { g =>
      mu += g.mult
      g.verts.foreach(v => deg(v) += g.mult)
    }
    val rho = mu.toDouble / nVerts
    groups.filter { g =>
      val muLow = mu - g.verts.map(deg).sum
      // keep unless density certainly increases after removing ψ's vertices
      !(muLow.toDouble / (nVerts - h) > rho)
    }
  }

  /** Build the network for guess α and return (dinic, s, t).
    *
    * Node layout: s = 0, vertices 1..nVerts, groups nVerts+1.., t = last.
    */
  def build(nVerts: Int, groups: Array[Group], h: Int, alpha: Double): (Dinic, Int, Int) = {
    val s = 0
    val t = nVerts + groups.length + 1
    val d = new Dinic(t + 1)
    val deg = new Array[Long](nVerts)
    groups.foreach(g => g.verts.foreach(v => deg(v) += g.mult))
    var v = 0
    while (v < nVerts) {
      if (deg(v) > 0) d.addEdge(s, v + 1, deg(v).toDouble)
      d.addEdge(v + 1, t, alpha * h)
      v += 1
    }
    var gi = 0
    while (gi < groups.length) {
      val g    = groups(gi)
      val node = nVerts + 1 + gi
      g.verts.foreach { u =>
        d.addEdge(u + 1, node, g.mult.toDouble)
        d.addEdge(node, u + 1, g.mult.toDouble * (h - 1))
      }
      gi += 1
    }
    (d, s, t)
  }

  /** Min-cut probe: vertices (dense ids) on the source side, excluding s.
    * Empty result ⇔ no subgraph has Ψ-density strictly greater than α.
    */
  def denserThan(nVerts: Int, groups: Array[Group], h: Int, alpha: Double): Array[Int] = {
    val (d, s, t) = build(nVerts, groups, h, alpha)
    d.maxFlow(s, t)
    val inS = d.minCutSourceSide(s)
    (0 until nVerts).filter(v => inS(v + 1)).toArray
  }

  /** Min-st-cut capacity of the network (used by Lemma-12 equality tests). */
  def minCutValue(nVerts: Int, groups: Array[Group], h: Int, alpha: Double): Double = {
    val (d, s, t) = build(nVerts, groups, h, alpha)
    d.maxFlow(s, t)
  }
}
