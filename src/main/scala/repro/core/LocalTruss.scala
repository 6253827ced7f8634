package repro.core

import scala.collection.mutable

/** A maximal pattern truss: its (canonical, src<dst) edges and the final
  * edge cohesions after peeling. The vertex set is induced from the edges.
  */
final case class Truss(edges: Vector[(Int, Int)], cohesion: Map[Long, Double]) {
  def isEmpty: Boolean = edges.isEmpty
  def nEdges: Int = edges.length
  lazy val vertices: Set[Int] = edges.iterator.flatMap(e => Iterator(e._1, e._2)).toSet
  def nVertices: Int = vertices.size
  def minCohesion: Double = if (edges.isEmpty) 0.0 else cohesion.valuesIterator.min

  /** Edge-set intersection with another truss (Proposition 5.3 pruning). */
  def intersectEdges(other: Truss): Vector[(Int, Int)] = {
    val keys = other.cohesion.keySet
    edges.filter(e => keys.contains(LocalTruss.ekey(e._1, e._2)))
  }
}

object Truss {
  val empty: Truss = Truss(Vector.empty, Map.empty)
}

/** The decomposed maximal pattern truss L_p of Section 6.1: a sequence of
  * (α_k, R_p(α_k)) nodes with strictly ascending thresholds, where R_p(α_k)
  * is the set of edges removed when C*_p(α_{k−1}) shrinks to C*_p(α_k).
  */
final case class Decomposition(nodes: Vector[(Double, Vector[(Int, Int)])]) {
  def isEmpty: Boolean = nodes.isEmpty
  def nEdgesTotal: Int = nodes.iterator.map(_._2.length).sum

  /** Nontrivial upper bound α*_p: C*_p(α) = ∅ for every α ≥ maxAlpha. */
  def maxAlpha: Double = if (nodes.isEmpty) 0.0 else nodes.last._1

  /** Equation 1: E*_p(α) = ∪_{α_k > α} R_p(α_k). Uses the same comparison
    * tolerance as the peeling so reconstruction matches direct MPTD even
    * when a cohesion value ties with α up to floating-point noise.
    */
  def trussAt(alpha: Double): Vector[(Int, Int)] =
    nodes.iterator.filter(_._1 > alpha + LocalTruss.Eps).flatMap(_._2).toVector
}

object Decomposition { val empty: Decomposition = Decomposition(Vector.empty) }

/** Exact, driver-local implementations of the paper's graph kernels:
  * Algorithm 1 (MPTD), the ascending-threshold truss decomposition of
  * Theorem 6.1, and theme-community extraction (maximal connected subgraphs).
  *
  * These run on one theme network at a time; the miners distribute *patterns*
  * across Spark tasks and call these kernels per pattern, because maximal
  * pattern trusses are small local subgraphs (paper Section 7.2).
  */
object LocalTruss {

  /** Comparison tolerance for `eco > α`. Edge cohesions are sums of
    * rational frequencies accumulated in different orders by the different
    * implementations (initial sums, decremental peeling, DataFrame
    * aggregation); a tie at exactly α would otherwise resolve differently
    * per implementation. Real cohesion gaps are ≫ 1e-9, floating-point
    * noise is ≪ 1e-9, so "≤ α" is implemented as "≤ α + Eps" everywhere.
    */
  val Eps: Double = 1e-9

  /** Canonical undirected edge key. */
  def ekey(u: Int, v: Int): Long =
    if (u < v) (u.toLong << 32) | (v.toLong & 0xffffffffL)
    else       (v.toLong << 32) | (u.toLong & 0xffffffffL)

  def dekey(k: Long): (Int, Int) = ((k >> 32).toInt, k.toInt)

  /** Induce the theme network G_p restricted to `edges`: keep only edges
    * whose both endpoints have positive pattern frequency.
    */
  def themeInduce(edges: Iterable[(Int, Int)], freq: Int => Double): Vector[(Int, Int)] =
    edges.iterator
      .filter { case (u, v) => freq(u) > 0.0 && freq(v) > 0.0 }
      .map { case (u, v) => if (u < v) (u, v) else (v, u) }
      .toVector

  /** Peeling state shared by MPTD and the decomposition: adjacency sets plus
    * live edge cohesions, supporting repeated `peel(α)` calls with ascending α.
    */
  private final class PeelState(edges0: Iterable[(Int, Int)], f: Int => Double) {
    val adj: mutable.Map[Int, mutable.Set[Int]] = mutable.Map.empty
    val eco: mutable.Map[Long, Double] = mutable.Map.empty

    for ((u, v) <- edges0 if u != v) {
      adj.getOrElseUpdate(u, mutable.Set.empty) += v
      adj.getOrElseUpdate(v, mutable.Set.empty) += u
    }
    // Initial cohesion (Algorithm 1 lines 2-8): for each edge, sum over the
    // triangles containing it of the min frequency of the three corners.
    for (u <- adj.keys; v <- adj(u) if u < v) {
      var s = 0.0
      val (small, large) = if (adj(u).size <= adj(v).size) (adj(u), adj(v)) else (adj(v), adj(u))
      for (w <- small if large.contains(w))
        s += math.min(math.min(f(u), f(v)), f(w))
      eco(ekey(u, v)) = s
    }

    /** Remove every edge whose cohesion is ≤ α, cascading (Algorithm 1
      * lines 9-18). Returns the removed edges.
      */
    def peel(alpha: Double): Vector[(Int, Int)] = {
      val threshold = alpha + Eps
      val removed = Vector.newBuilder[(Int, Int)]
      val queue = mutable.ArrayDeque.empty[Long]
      for ((k, c) <- eco if c <= threshold) queue.append(k)
      while (queue.nonEmpty) {
        val k = queue.removeHead()
        if (eco.contains(k) && eco(k) <= threshold) {
          val (u, v) = dekey(k)
          val (small, large) = if (adj(u).size <= adj(v).size) (adj(u), adj(v)) else (adj(v), adj(u))
          val common = small.iterator.filter(large.contains).toArray
          val fuv = math.min(f(u), f(v))
          for (w <- common) {
            val m = math.min(fuv, f(w))
            val kuw = ekey(u, w); val kvw = ekey(v, w)
            eco(kuw) -= m
            eco(kvw) -= m
            if (eco(kuw) <= threshold) queue.append(kuw)
            if (eco(kvw) <= threshold) queue.append(kvw)
          }
          adj(u) -= v; adj(v) -= u
          eco.remove(k)
          removed += dekey(k)
        }
      }
      removed.result()
    }

    def remaining: Truss = {
      val m = eco.toMap
      Truss(m.keysIterator.map(dekey).toVector.sorted, m)
    }
  }

  /** Algorithm 1: the maximal pattern truss C*_p(α) of the theme network
    * given by `edges` and vertex frequencies `freq`. The input need not be
    * theme-induced; zero-frequency endpoints yield zero-cohesion edges which
    * peel away (α ≥ 0 always).
    */
  def mptd(edges: Iterable[(Int, Int)], freq: Int => Double, alpha: Double): Truss = {
    require(alpha >= 0.0, s"alpha must be >= 0, got $alpha")
    val st = new PeelState(edges, freq)
    st.peel(alpha)
    st.remaining
  }

  /** Theorem 6.1 decomposition of C*_p(0) into L_p: repeatedly set the next
    * threshold to the minimum surviving edge cohesion β and record the edges
    * removed by peeling at β. Terminates because each step removes ≥ 1 edge.
    */
  def decompose(edges: Iterable[(Int, Int)], freq: Int => Double): Decomposition = {
    val st = new PeelState(edges, freq)
    st.peel(0.0)
    val nodes = Vector.newBuilder[(Double, Vector[(Int, Int)])]
    while (st.eco.nonEmpty) {
      val beta = st.eco.valuesIterator.min
      val removed = st.peel(beta)
      nodes += ((beta, removed.sorted))
    }
    Decomposition(nodes.result())
  }

  /** Maximal connected subgraphs of a truss = the theme communities
    * (Definition 3.5). Union-find over the truss edges; returns the vertex
    * sets, largest first.
    */
  def connectedComponents(edges: Iterable[(Int, Int)]): Vector[Set[Int]] = {
    val parent = mutable.Map.empty[Int, Int]
    def find(x: Int): Int = {
      var r = x
      while (parent.getOrElse(r, r) != r) r = parent(r)
      var c = x
      while (parent.getOrElse(c, c) != c) { val nx = parent(c); parent(c) = r; c = nx }
      r
    }
    for ((u, v) <- edges) {
      parent.getOrElseUpdate(u, u); parent.getOrElseUpdate(v, v)
      val ru = find(u); val rv = find(v)
      if (ru != rv) parent(ru) = rv
    }
    parent.keys
      .groupBy(find)
      .values.map(_.toSet).toVector
      .sortBy(s => (-s.size, s.min))
  }
}
