package repro.patterns

import repro.cliques.CliqueEnum
import repro.graph.LocalGraph
import scala.collection.mutable

/** A pattern Ψ (Section 7): a small connected simple graph.
  *
  * An *instance* is a distinct EDGE SET of G isomorphic to Ψ (Definitions
  * 8–10 — automorphisms of the same edge set are not distinguished).
  * `instances` returns one vertex set per instance; two instances may share
  * a vertex set (e.g. the three 4-cycles inside a K4), in which case the
  * vertex set appears once per distinct edge set — exactly what the
  * clique/pattern-degree and the `construct+` grouping (Algorithm 7) need.
  */
sealed abstract class Pattern(val name: String, val numVertices: Int) extends Serializable {

  /** All instances of Ψ in `g`, as sorted local-vertex-id arrays. */
  def instances(g: LocalGraph): Array[Array[Int]]

  /** Pattern-degree deg_G(v, Ψ) per vertex (Definition 9). Overridden with
    * closed-form counting for stars and the diamond (Appendix D).
    */
  def degrees(g: LocalGraph): Array[Long] = {
    val d = new Array[Long](g.n)
    instances(g).foreach { inst =>
      var i = 0
      while (i < inst.length) { d(inst(i)) += 1; i += 1 }
    }
    d
  }

  /** μ(G, Ψ): the number of instances in `g`. */
  def count(g: LocalGraph): Long = instances(g).length.toLong

  override def toString: String = name
}

object Pattern {

  /** h-clique (h >= 2); Edge is the 2-clique, Triangle the 3-clique. */
  final case class Clique(h: Int) extends Pattern(s"$h-clique", h) {
    require(h >= 2)
    override def instances(g: LocalGraph): Array[Array[Int]] = CliqueEnum.instances(g, h)
    override def degrees(g: LocalGraph): Array[Long]         = CliqueEnum.degrees(g, h)
    override def count(g: LocalGraph): Long                  = CliqueEnum.count(g, h)
  }

  val Edge: Clique     = Clique(2)
  val Triangle: Clique = Clique(3)

  /** x-star: a center with x tail vertices (2-star, c3-star=Star(3), 4-star). */
  final case class Star(tails: Int) extends Pattern(s"$tails-star", tails + 1) {
    require(tails >= 2)

    override def instances(g: LocalGraph): Array[Array[Int]] = {
      val out = mutable.ArrayBuffer.empty[Array[Int]]
      val pick = new Array[Int](tails)
      def combos(nbrs: Array[Int], start: Int, depth: Int, center: Int): Unit = {
        if (depth == tails) {
          val inst = new Array[Int](tails + 1)
          inst(0) = center
          System.arraycopy(pick, 0, inst, 1, tails)
          java.util.Arrays.sort(inst)
          out += inst
        } else {
          var i = start
          while (i <= nbrs.length - (tails - depth)) {
            pick(depth) = nbrs(i)
            combos(nbrs, i + 1, depth + 1, center)
            i += 1
          }
        }
      }
      var c = 0
      while (c < g.n) { combos(g.adj(c), 0, 0, c); c += 1 }
      out.toArray
    }

    /** Closed-form star degree (Appendix D.1, Eq. 25):
      * C(deg(v), x) as center + Σ_{u∈N(v)} C(deg(u)-1, x-1) as a tail.
      */
    override def degrees(g: LocalGraph): Array[Long] = {
      val x = tails
      Array.tabulate(g.n) { v =>
        var t = Combinatorics.choose(g.degree(v), x)
        val a = g.adj(v)
        var i = 0
        while (i < a.length) { t += Combinatorics.choose(g.degree(a(i)) - 1, x - 1); i += 1 }
        t
      }
    }

    override def count(g: LocalGraph): Long =
      (0 until g.n).foldLeft(0L)((acc, v) => acc + Combinatorics.choose(g.degree(v), tails))
  }

  /** Diamond = the 4-cycle C4 (per Appendix D.2 its pattern-degree counts
    * pairs of 2-paths sharing both endpoints, which is exactly C4 counting;
    * chords are allowed because instances are non-induced edge sets).
    */
  case object Diamond extends Pattern("diamond", 4) {

    override def instances(g: LocalGraph): Array[Array[Int]] = {
      val out = mutable.ArrayBuffer.empty[Array[Int]]
      // Enumerate by diagonal pair (u, v), u < v: every pair {a, b} of common
      // neighbors closes a 4-cycle u-a-v-b. Each C4 has two diagonals; keep
      // the occurrence whose diagonal pair is lexicographically smaller.
      var u = 0
      while (u < g.n) {
        // common neighbors per second diagonal endpoint v > u
        val common = mutable.HashMap.empty[Int, mutable.ArrayBuilder.ofInt]
        val nu = g.adj(u)
        var i = 0
        while (i < nu.length) {
          val a  = nu(i)
          val na = g.adj(a)
          var j = 0
          while (j < na.length) {
            val v = na(j)
            if (v > u && v != u) common.getOrElseUpdate(v, new mutable.ArrayBuilder.ofInt).addOne(a)
            j += 1
          }
          i += 1
        }
        common.foreach { case (v, cb) =>
          val cs = cb.result()
          var x = 0
          while (x < cs.length) {
            var y = x + 1
            while (y < cs.length) {
              val a = math.min(cs(x), cs(y)); val b = math.max(cs(x), cs(y))
              // diagonal pairs: (u, v) and (a, b); keep if (u, v) < (a, b)
              if (u < a || (u == a && v < b)) {
                val inst = Array(u, v, cs(x), cs(y))
                java.util.Arrays.sort(inst)
                out += inst
              }
              y += 1
            }
            x += 1
          }
        }
        u += 1
      }
      out.toArray
    }

    /** Closed-form C4 degree: Σ_{u≠v} C(|N(v) ∩ N(u)|, 2) over all 2-hop
      * (and adjacent) endpoints u (Appendix D.2).
      */
    override def degrees(g: LocalGraph): Array[Long] = {
      Array.tabulate(g.n) { v =>
        val paths = mutable.HashMap.empty[Int, Int]
        val nv = g.adj(v)
        var i = 0
        while (i < nv.length) {
          val a  = nv(i)
          val na = g.adj(a)
          var j = 0
          while (j < na.length) {
            val u = na(j)
            if (u != v) paths.update(u, paths.getOrElse(u, 0) + 1)
            j += 1
          }
          i += 1
        }
        paths.valuesIterator.foldLeft(0L)((acc, c) => acc + Combinatorics.choose(c, 2))
      }
    }

    override def count(g: LocalGraph): Long = degrees(g).sum / 4
  }

  /** 2-triangle: two triangles sharing an edge (4 vertices, 5 edges). */
  case object TwoTriangle extends Pattern("2-triangle", 4) {
    override def instances(g: LocalGraph): Array[Array[Int]] = {
      val out = mutable.ArrayBuffer.empty[Array[Int]]
      // shared edge (u, v) + unordered pair {a, b} of common neighbors;
      // the 5-edge set determines (u, v) (its two degree-3 endpoints), so
      // each instance is produced exactly once.
      for ((u, v) <- g.edges) {
        val cs = g.adj(u).filter(w => w != v && g.hasEdge(v, w))
        var x = 0
        while (x < cs.length) {
          var y = x + 1
          while (y < cs.length) {
            val inst = Array(u, v, cs(x), cs(y))
            java.util.Arrays.sort(inst)
            out += inst
            y += 1
          }
          x += 1
        }
      }
      out.toArray
    }
  }

  /** P4: the path on 4 vertices (3 edges). */
  case object Path4 extends Pattern("4-path", 4) {
    override def instances(g: LocalGraph): Array[Array[Int]] = {
      val out = mutable.ArrayBuffer.empty[Array[Int]]
      // middle edge (b, c) with b < c; a attaches to b, d attaches to c.
      for ((b, c) <- g.edges) {
        val as = g.adj(b).filter(_ != c)
        val ds = g.adj(c).filter(_ != b)
        var i = 0
        while (i < as.length) {
          var j = 0
          while (j < ds.length) {
            if (as(i) != ds(j)) {
              val inst = Array(as(i), b, c, ds(j))
              java.util.Arrays.sort(inst)
              out += inst
            }
            j += 1
          }
          i += 1
        }
      }
      out.toArray
    }
  }

  /** Tailed triangle: a triangle with one pendant edge (4 vertices, 4 edges). */
  case object TailedTriangle extends Pattern("tailed-triangle", 4) {
    override def instances(g: LocalGraph): Array[Array[Int]] = {
      val out = mutable.ArrayBuffer.empty[Array[Int]]
      CliqueEnum.forEach(g, 3) { tri =>
        val t = tri.clone()
        var i = 0
        while (i < 3) {
          val c = t(i)
          val a = g.adj(c)
          var j = 0
          while (j < a.length) {
            val d = a(j)
            if (d != t(0) && d != t(1) && d != t(2)) {
              val inst = Array(t(0), t(1), t(2), d)
              java.util.Arrays.sort(inst)
              out += inst
            }
            j += 1
          }
          i += 1
        }
      }
      out.toArray
    }
  }

  /** Generic pattern from an explicit edge list over vertices 0..p-1.
    * Enumeration is VF2-style backtracking with edge-set deduplication —
    * the correctness reference for the specialized enumerators above.
    */
  final case class Generic(override val name: String, pEdges: Seq[(Int, Int)])
      extends Pattern(name, pEdges.flatMap(e => Seq(e._1, e._2)).max + 1) {

    private val p = numVertices
    private val pAdj: Array[Array[Int]] = {
      val b = Array.fill(p)(mutable.Set.empty[Int])
      pEdges.foreach { case (a, c) => b(a) += c; b(c) += a }
      b.map(_.toArray.sorted)
    }
    // visit order: each pattern vertex after the first touches an earlier one
    private val visitOrder: Array[Int] = {
      val order = mutable.ArrayBuffer(0)
      val seen  = mutable.Set(0)
      while (order.size < p) {
        val next = (0 until p).find(v => !seen(v) && pAdj(v).exists(seen)).get
        order += next; seen += next
      }
      order.toArray
    }

    override def instances(g: LocalGraph): Array[Array[Int]] = {
      val found = mutable.HashMap.empty[Seq[Long], Array[Int]]
      val map   = Array.fill(p)(-1)
      val used  = mutable.Set.empty[Int]

      def edgeKey(a: Int, b: Int): Long =
        if (a < b) (a.toLong << 32) | b.toLong else (b.toLong << 32) | a.toLong

      def rec(i: Int): Unit = {
        if (i == p) {
          val key = pEdges.map { case (a, c) => edgeKey(map(a), map(c)) }.sorted
          if (!found.contains(key)) found(key) = map.clone().sorted
          return
        }
        val pv = visitOrder(i)
        val anchors = pAdj(pv).filter(map(_) >= 0)
        val candidates: Iterable[Int] =
          if (anchors.isEmpty) 0 until g.n else g.adj(map(anchors.head)).toSeq
        for (gv <- candidates if !used(gv)) {
          if (anchors.forall(a => g.hasEdge(map(a), gv))) {
            map(pv) = gv; used += gv
            rec(i + 1)
            map(pv) = -1; used -= gv
          }
        }
      }
      rec(0)
      found.values.toArray
    }
  }

  /** Generic (reference) versions of the named patterns, for cross-checks. */
  def genericOf(p: Pattern): Generic = p match {
    case Clique(h) =>
      Generic(s"generic-$h-clique", for (i <- 0 until h; j <- (i + 1) until h) yield (i, j))
    case Star(x) => Generic(s"generic-$x-star", (1 to x).map(i => (0, i)))
    case Diamond => Generic("generic-diamond", Seq((0, 1), (1, 2), (2, 3), (3, 0)))
    case TwoTriangle =>
      Generic("generic-2-triangle", Seq((0, 1), (0, 2), (1, 2), (0, 3), (1, 3)))
    case Path4 => Generic("generic-4-path", Seq((0, 1), (1, 2), (2, 3)))
    case TailedTriangle =>
      Generic("generic-tailed-triangle", Seq((0, 1), (1, 2), (0, 2), (2, 3)))
    case g: Generic => g
  }

  /** Named lookup used by jobs / benches. */
  def byName(s: String): Pattern = s.toLowerCase match {
    case "edge"             => Edge
    case "triangle"         => Triangle
    case "4-clique"         => Clique(4)
    case "5-clique"         => Clique(5)
    case "6-clique"         => Clique(6)
    case "2-star"           => Star(2)
    case "c3-star" | "3-star" => Star(3)
    case "4-star"           => Star(4)
    case "diamond"          => Diamond
    case "2-triangle"       => TwoTriangle
    case "4-path"           => Path4
    case "tailed-triangle"  => TailedTriangle
    case other              => throw new IllegalArgumentException(s"unknown pattern: $other")
  }
}

/** Small combinatorics helpers shared by pattern counting. */
object Combinatorics {
  /** n choose k as Long (0 when k < 0 or k > n); saturates at Long.MaxValue. */
  def choose(n: Int, k: Int): Long = {
    if (k < 0 || n < 0 || k > n) return 0L
    val kk = math.min(k, n - k)
    var acc = 1.0
    var res = 1L
    var i = 1
    while (i <= kk) {
      acc = acc * (n - kk + i) / i
      if (acc > Long.MaxValue / 2.0) return Long.MaxValue
      res = res * (n - kk + i) / i // exact because prefix products of C are integral
      i += 1
    }
    res
  }
}
