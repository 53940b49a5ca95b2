package repro.core

import repro.flow.DensestFlow
import repro.graph.LocalGraph
import repro.patterns.Pattern
import scala.collection.mutable

/** CoreExact (Algorithm 4): exact CDS/PDS via (k, Ψ)-cores.
  *
  * Optimizations over [[Exact]], as in Section 6.1:
  *  1. tighter α bounds — l = ρ'' (best residual / component density from the
  *     decomposition), u = k_max;
  *  2. the CDS is located inside the (k'', Ψ)-core (Prunings 1+2), and binary
  *     search runs per connected component with the component-local stopping
  *     criterion (Pruning 3);
  *  3. flow-network nodes pruned by Lemma 8, instances grouped by vertex set
  *     (construct+, a no-op for cliques);
  *  4. as the lower bound l grows, components shrink to the (⌈l⌉, Ψ)-core,
  *     so later networks get smaller.
  *
  * Deviation (documented in DESIGN.md): the upper bound u is NOT carried
  * across components — a failed probe in one component bounds only that
  * component's density. Algorithm 4's pseudocode shares u globally, which is
  * unsound when the CDS lives in a later component; per-component u preserves
  * every claimed optimization while keeping exactness.
  */
object CoreExact {

  /** Instrumentation for Table 3 / Figure 9. */
  final case class Stats(coreDecompNanos: Long,
                         totalNanos: Long,
                         networkNodeCounts: Vector[Int],
                         probes: Int)

  def run(g: LocalGraph, psi: Pattern): Subgraph = runWithStats(g, psi)._1

  def runWithStats(g: LocalGraph, psi: Pattern): (Subgraph, Stats) = {
    val t0 = System.nanoTime()
    val n  = g.n
    if (n == 0)
      return (Subgraph(Array.empty, 0L, 0.0), Stats(0, System.nanoTime() - t0, Vector.empty, 0))

    val instances = psi.instances(g)
    val dec       = CliqueCore.decomposeInstances(n, instances)
    val tCore     = System.nanoTime() - t0
    if (instances.isEmpty)
      return (Subgraph(Array(0), 0L, 0.0), Stats(tCore, System.nanoTime() - t0, Vector.empty, 0))

    val h    = psi.numVertices
    val core = dec.core
    val kMax = dec.kMax

    def ceilL(x: Double): Long = math.ceil(x - 1e-9).toLong

    // Pruning 1: ρ' from the residual subgraphs of the decomposition.
    val kPrime  = math.max(1L, ceilL(dec.bestDensity))
    val kpVerts = dec.coreVertices(kPrime)

    // Pruning 2: per-component densities of the (k', Ψ)-core, one pass over Λ.
    val compsKp = componentsWithin(g, kpVerts)
    var best    = Densest.subgraphOf(instances, n, dec.bestResidualVertices)
    var rhoPP: Double = best.density
    locally {
      val compId = Array.fill(n)(-1)
      compsKp.iterator.zipWithIndex.foreach { case (cc, i) => cc.foreach(compId(_) = i) }
      val perComp = new Array[Long](compsKp.length)
      instances.foreach { inst =>
        val c0 = compId(inst(0))
        if (c0 >= 0) {
          var ok = true; var i = 1
          while (ok && i < inst.length) { ok = compId(inst(i)) == c0; i += 1 }
          if (ok) perComp(c0) += 1
        }
      }
      compsKp.iterator.zipWithIndex.foreach { case (cc, i) =>
        val dens = perComp(i).toDouble / cc.length
        if (dens > rhoPP) rhoPP = dens
        if (dens > best.density) best = Subgraph(cc, perComp(i), dens)
      }
    }
    val kPP = math.max(kPrime, ceilL(rhoPP))

    var l        = rhoPP
    val u        = kMax.toDouble
    var probes   = 0
    val netSizes = Vector.newBuilder[Int]

    val comps = componentsWithin(g, dec.coreVertices(kPP))
    comps.foreach { cc0 =>
      var cv = cc0
      // shrink to the (⌈l⌉, Ψ)-core if l already exceeds k''
      if (ceilL(l) > kPP) cv = cv.filter(v => core(v) >= ceilL(l))

      if (cv.length >= h) {
        var shrinkK = math.max(kPP, ceilL(l))

        def networkOf(vs: Array[Int]): (Array[DensestFlow.Group], Array[Int]) = {
          val mask = new Array[Boolean](n)
          vs.foreach(mask(_) = true)
          val remap = new Array[Int](n)
          vs.iterator.zipWithIndex.foreach { case (v, i) => remap(v) = i }
          val sub = instances.iterator
            .filter { inst =>
              var ok = true; var i = 0
              while (ok && i < inst.length) { ok = mask(inst(i)); i += 1 }
              ok
            }
            .map(inst => inst.map(remap).sorted)
            .toArray
          val gs = DensestFlow.pruneLemma8(vs.length, DensestFlow.group(sub), h)
          (gs, vs)
        }

        var (groups, verts) = networkOf(cv)

        def probe(alpha: Double): Array[Int] = {
          probes += 1
          netSizes += verts.length + groups.length + 2
          val s = DensestFlow.denserThan(verts.length, groups, h, alpha)
          s.map(verts)
        }

        // feasibility at the current lower bound (Algorithm 4 lines 7-10)
        val first = probe(l)
        if (first.nonEmpty) {
          val cand0 = Densest.subgraphOf(instances, n, first)
          if (cand0.density > best.density) best = cand0
          if (cand0.density > l) l = cand0.density

          var uc = u
          var continue = true
          while (continue && verts.length >= h &&
                 uc - l >= 1.0 / (verts.length.toLong * math.max(1L, verts.length.toLong - 1L))) {
            val alpha = (l + uc) / 2
            val s     = probe(alpha)
            if (s.isEmpty) uc = alpha
            else {
              val cand = Densest.subgraphOf(instances, n, s)
              if (cand.density > best.density) best = cand
              l = math.max(alpha, cand.density)
              // Optimization 4: locate the CDS in a higher core as l grows.
              if (ceilL(l) > shrinkK) {
                shrinkK = ceilL(l)
                val nv = verts.filter(v => core(v) >= shrinkK)
                if (nv.length < h) continue = false
                else {
                  val nw = networkOf(nv)
                  groups = nw._1; verts = nw._2
                }
              }
            }
          }
        }
      }
    }
    (best, Stats(tCore, System.nanoTime() - t0, netSizes.result(), probes))
  }

  /** Connected components restricted to `subset`, returned in g-local ids. */
  def componentsWithin(g: LocalGraph, subset: Array[Int]): Seq[Array[Int]] = {
    val inSet = new Array[Boolean](g.n)
    subset.foreach(inSet(_) = true)
    val seen = new Array[Boolean](g.n)
    val out  = mutable.ArrayBuffer.empty[Array[Int]]
    subset.foreach { s =>
      if (!seen(s)) {
        val comp  = new mutable.ArrayBuilder.ofInt
        val stack = new mutable.ArrayDeque[Int]()
        seen(s) = true; stack.append(s)
        while (stack.nonEmpty) {
          val v = stack.removeLast()
          comp.addOne(v)
          g.adj(v).foreach { w =>
            if (inSet(w) && !seen(w)) { seen(w) = true; stack.append(w) }
          }
        }
        out += comp.result()
      }
    }
    out.toSeq
  }
}
