package repro.index

import org.apache.spark.sql.SparkSession
import repro.core._

import scala.collection.mutable

/** One TC-Tree node: the item appended to the parent's pattern, the full
  * pattern it represents, and the decomposed maximal pattern truss L_p
  * (Section 6.1). Nodes with L_p = ∅ are never materialised (Section 6.2).
  */
final class TCNode(val item: Int, val pattern: Vector[Int], val decomp: Decomposition) {
  val children: mutable.ArrayBuffer[TCNode] = mutable.ArrayBuffer.empty

  /** C*_p(α) edges via Equation 1. */
  def trussAt(alpha: Double): Vector[(Int, Int)] = decomp.trussAt(alpha)
}

/** Result of a TC-Tree query: the retrieved maximal pattern trusses, keyed by
  * pattern. `retrievedNodes` is the paper's RN metric (Figure 5).
  */
final case class TCQueryResult(results: Vector[(Vector[Int], Vector[(Int, Int)])]) {
  def retrievedNodes: Int = results.length

  /** Theme communities: maximal connected subgraphs of each retrieved truss. */
  def communities: Seq[(Vector[Int], Set[Int])] =
    results.flatMap { case (p, es) => LocalTruss.connectedComponents(es).map(c => (p, c)) }
}

/** The Theme Community Tree (Section 6.2): a set-enumeration tree over the
  * item universe where each kept node stores the decomposition of its
  * pattern's maximal pattern truss at α = 0. Supports query answering for
  * any (q, α_q) without recomputation (Algorithm 5).
  */
final class TCTree(val root: TCNode) {

  /** All non-root nodes in breadth-first order. */
  def nodes: Vector[TCNode] = {
    val out = Vector.newBuilder[TCNode]
    val q = mutable.Queue(root)
    while (q.nonEmpty) {
      val n = q.dequeue()
      n.children.foreach { c => out += c; q.enqueue(c) }
    }
    out.result()
  }

  /** #Nodes of Table 3 (root excluded; every node = one maximal pattern truss). */
  def nNodes: Int = nodes.length

  def maxDepth: Int = {
    def d(n: TCNode): Int = if (n.children.isEmpty) 0 else 1 + n.children.map(d).max
    d(root)
  }

  def nodesAtDepth(depth: Int): Vector[TCNode] = nodes.filter(_.pattern.length == depth)

  /** Largest nontrivial α over the whole tree: for α_q ≥ this, QBA returns ∅. */
  def alphaStar: Double = {
    val ns = nodes
    if (ns.isEmpty) 0.0 else ns.iterator.map(_.decomp.maxAlpha).max
  }

  /** Algorithm 5: answer query (q, α_q). Prunes a subtree as soon as the
    * child's item is outside q (its descendants cannot be sub-patterns of q)
    * or the child's truss at α_q is empty (Proposition 5.2 on descendants).
    */
  def query(q: Set[Int], alphaQ: Double): TCQueryResult = {
    val out = Vector.newBuilder[(Vector[Int], Vector[(Int, Int)])]
    val queue = mutable.Queue(root)
    while (queue.nonEmpty) {
      val nf = queue.dequeue()
      for (nc <- nf.children if q.contains(nc.item)) {
        val truss = nc.trussAt(alphaQ)
        if (truss.nonEmpty) {
          out += ((nc.pattern, truss))
          queue.enqueue(nc)
        }
      }
    }
    TCQueryResult(out.result())
  }

  /** Query-by-Alpha (Section 7.3): q = S. */
  def queryByAlpha(allItems: Set[Int], alphaQ: Double): TCQueryResult = query(allItems, alphaQ)

  /** Query-by-Pattern (Section 7.3): α_q = 0. */
  def queryByPattern(q: Vector[Int]): TCQueryResult = query(q.toSet, 0.0)
}

object TCTree {

  /** Algorithm 4: build the TC-Tree of a database network.
    *
    * Layer 1 (single items) is embarrassingly parallel — the paper uses
    * OpenMP threads; we distribute the items over Spark tasks with the
    * compact network broadcast. Deeper layers go level-by-level: each
    * sibling pair (n_f, n_b) with s_{n_f} ≺ s_{n_b} yields candidate child
    * pattern p_f ∪ p_b whose truss is computed *inside*
    * C*_{p_f}(0) ∩ C*_{p_b}(0) (Proposition 5.3); empty intersections are
    * pruned on the driver without shipping a task.
    *
    * @param maxDepth safety cap on pattern length (the enumeration
    *                 terminates on its own when decompositions are empty).
    */
  def build(spark: SparkSession, net: CompactNetwork, maxDepth: Int = Int.MaxValue): TCTree = {
    val sc = spark.sparkContext
    val bc = sc.broadcast(net)

    def computeDecomp(pattern: Vector[Int], within: Iterable[(Int, Int)], n: CompactNetwork): Decomposition = {
      val f = MinerOps.freqFn(n, pattern)
      LocalTruss.decompose(LocalTruss.themeInduce(within, f), f)
    }

    val root = new TCNode(-1, Vector.empty, Decomposition.empty)

    // Layer 1: every item of S in parallel (Algorithm 4 lines 2-5).
    val layer1 = sc
      .parallelize(net.items.toIndexedSeq, MinerOps.slices(spark, net.items.length))
      .map { s =>
        val n = bc.value
        (s, computeDecomp(Vector(s), n.edgeList, n))
      }
      .filter(!_._2.isEmpty)
      .collect()
      .sortBy(_._1)
    layer1.foreach { case (s, d) => root.children += new TCNode(s, Vector(s), d) }

    // Deeper layers, breadth-first (Algorithm 4 lines 6-12). `parentLevel`
    // holds the nodes whose children form the deepest completed level; each
    // such child group is a sibling set generating the next level.
    var parentLevel: Vector[TCNode] = Vector(root)
    var depth = 1
    while (parentLevel.nonEmpty && depth < maxDepth) {
      val parents = mutable.ArrayBuffer.empty[TCNode]
      val tasks = mutable.ArrayBuffer.empty[(Int, Int, Vector[Int], Vector[(Int, Int)])]
      for (p <- parentLevel if p.children.nonEmpty) {
        val sib = p.children.sortBy(_.item).toVector
        val edgeKeys = sib.map(n => n.trussAt(0.0).map(e => LocalTruss.ekey(e._1, e._2)).toSet)
        for (i <- sib.indices; j <- (i + 1) until sib.length) {
          val nf = sib(i); val nb = sib(j)
          val inter = nf.trussAt(0.0).filter(e => edgeKeys(j).contains(LocalTruss.ekey(e._1, e._2)))
          if (inter.nonEmpty) {
            parents += nf
            tasks += ((parents.length - 1, nb.item, nf.pattern :+ nb.item, inter))
          }
        }
      }
      if (tasks.nonEmpty) {
        val results = sc
          .parallelize(tasks.toIndexedSeq, MinerOps.slices(spark, tasks.length))
          .map { case (ref, item, pattern, edges) =>
            (ref, item, pattern, computeDecomp(pattern, edges, bc.value))
          }
          .filter(!_._4.isEmpty)
          .collect()
        results.sortBy(r => (r._1, r._2)).foreach { case (ref, item, pattern, d) =>
          parents(ref).children += new TCNode(item, pattern, d)
        }
      }
      parentLevel = parentLevel.flatMap(_.children)
      depth += 1
    }
    bc.destroy()
    new TCTree(root)
  }
}
