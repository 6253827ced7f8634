package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

/** Algorithm 1 (MPTD), the Theorem 6.1 decomposition, and theme-community
  * extraction, on hand-built graphs plus randomized cases verified against
  * brute-force enumeration of all pattern trusses.
  */
class LocalTrussSuite extends AnyFunSuite {
  import LocalTruss._

  private val one: Int => Double = _ => 1.0

  /** Edge cohesion of every edge computed from scratch within `sub`. */
  private def ecoWithin(sub: Seq[(Int, Int)], f: Int => Double): Map[Long, Double] = {
    val adj = sub.flatMap { case (u, v) => Seq(u -> v, v -> u) }
      .groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
    sub.map { case (u, v) =>
      val common = adj.getOrElse(u, Set.empty) intersect adj.getOrElse(v, Set.empty)
      ekey(u, v) -> common.toSeq.map(w => math.min(math.min(f(u), f(v)), f(w))).sum
    }.toMap
  }

  private def isPatternTruss(sub: Seq[(Int, Int)], f: Int => Double, alpha: Double): Boolean =
    ecoWithin(sub, f).values.forall(_ > alpha)

  /** Union of ALL pattern trusses = maximal pattern truss, by 2^|E| enumeration. */
  private def bruteMaximal(edges: Vector[(Int, Int)], f: Int => Double, alpha: Double): Set[(Int, Int)] = {
    require(edges.length <= 12)
    var acc = Set.empty[(Int, Int)]
    for (mask <- 1 until (1 << edges.length)) {
      val sub = edges.indices.collect { case i if (mask & (1 << i)) != 0 => edges(i) }
      if (isPatternTruss(sub, f, alpha)) acc ++= sub
    }
    acc
  }

  test("ekey/dekey round-trip and canonical orientation") {
    assert(dekey(ekey(3, 7)) == ((3, 7)))
    assert(ekey(7, 3) == ekey(3, 7))
    assert(dekey(ekey(100000, 2)) == ((2, 100000)))
  }

  test("themeInduce drops edges with a zero-frequency endpoint") {
    val f = Map(0 -> 1.0, 1 -> 0.5, 2 -> 0.0).withDefaultValue(0.0)
    val induced = themeInduce(Seq((0, 1), (1, 2), (0, 2)), f)
    assert(induced == Vector((0, 1)))
  }

  test("themeInduce canonicalises edge orientation") {
    val induced = themeInduce(Seq((5, 1)), _ => 1.0)
    assert(induced == Vector((1, 5)))
  }

  test("triangle, all frequencies 1: eco = 1 on every edge") {
    val t = mptd(Seq((0, 1), (1, 2), (0, 2)), one, 0.5)
    assert(t.edges.toSet == Set((0, 1), (0, 2), (1, 2)))
    assert(t.cohesion.values.forall(c => math.abs(c - 1.0) < 1e-12))
  }

  test("triangle, all frequencies 1: empty at alpha = 1 (strict threshold)") {
    assert(mptd(Seq((0, 1), (1, 2), (0, 2)), one, 1.0).isEmpty)
  }

  test("single edge (no triangle) has cohesion 0 and never survives") {
    assert(mptd(Seq((0, 1)), one, 0.0).isEmpty)
  }

  test("K5 with all frequencies 1 is the 5-truss: eco = 3 per edge") {
    val edges = (for (i <- 0 until 5; j <- (i + 1) until 5) yield (i, j)).toVector
    val t = mptd(edges, one, 2.0) // alpha = k - 3 for k = 5
    assert(t.nEdges == 10)
    assert(t.cohesion.values.forall(c => math.abs(c - 3.0) < 1e-12))
    assert(mptd(edges, one, 3.0).isEmpty)
  }

  test("pattern truss generalises k-truss: alpha = k-3 with unit frequencies") {
    // K4 plus a pendant triangle: 4-truss = the K4 (alpha = 1).
    val k4 = Vector((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3))
    val edges = k4 ++ Vector((3, 4), (3, 5), (4, 5))
    val t = mptd(edges, one, 1.0)
    assert(t.edges.toSet == k4.toSet)
  }

  test("cascading removal: bowtie of two triangles sharing an edge") {
    // Edges of triangle A {0,1,2} and B {1,2,3}; shared edge (1,2) has eco 2.
    val edges = Vector((0, 1), (0, 2), (1, 2), (1, 3), (2, 3))
    val t0 = mptd(edges, one, 0.0)
    assert(t0.nEdges == 5)
    assert(math.abs(t0.cohesion(ekey(1, 2)) - 2.0) < 1e-12)
    // alpha = 1: outer edges (eco 1) go first, which starves (1,2) -> empty.
    assert(mptd(edges, one, 1.0).isEmpty)
  }

  test("min-frequency vertex caps the cohesion of its triangles") {
    val f = Map(0 -> 1.0, 1 -> 0.5, 2 -> 0.2).withDefaultValue(0.0)
    val t = mptd(Seq((0, 1), (1, 2), (0, 2)), f, 0.1)
    assert(t.nEdges == 3)
    assert(t.cohesion.values.forall(c => math.abs(c - 0.2) < 1e-12))
    assert(mptd(Seq((0, 1), (1, 2), (0, 2)), f, 0.2).isEmpty)
  }

  test("zero-frequency vertex contributes nothing even inside a clique") {
    val f = Map(0 -> 1.0, 1 -> 1.0, 2 -> 1.0, 3 -> 0.0).withDefaultValue(0.0)
    val k4 = Vector((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3))
    val t = mptd(k4, f, 0.0)
    // Theme induction drops v3's edges; remaining triangle {0,1,2} survives.
    assert(t.vertices == Set(0, 1, 2))
  }

  test("mptd equals brute-force union of all pattern trusses (40 random graphs)") {
    val rnd = new Random(7)
    var checked = 0
    while (checked < 40) {
      val n = 5 + rnd.nextInt(2)
      val edges = (for (i <- 0 until n; j <- (i + 1) until n if rnd.nextDouble() < 0.5)
        yield (i, j)).toVector
      if (edges.length <= 12 && edges.nonEmpty) {
        val fArr = Array.fill(n)(rnd.nextInt(11) / 10.0)
        val f: Int => Double = fArr(_)
        val alpha = rnd.nextInt(4) * 0.25
        val got = mptd(edges, f, alpha).edges.toSet
        val expected = bruteMaximal(edges, f, alpha)
        assert(got == expected, s"n=$n edges=$edges f=${fArr.toList} alpha=$alpha")
        checked += 1
      }
    }
  }

  test("mptd is idempotent: re-running on its own output is a fixed point") {
    val rnd = new Random(8)
    for (_ <- 0 until 20) {
      val g = repro.TestNets.randomNet(rnd)
      val c = g.compact
      val f = MinerOps.freqFn(c, Vector(0))
      val t = mptd(themeInduce(g.edges, f), f, 0.1)
      val t2 = mptd(t.edges, f, 0.1)
      assert(t2.edges.toSet == t.edges.toSet)
      for (e <- t.edges)
        assert(math.abs(t2.cohesion(ekey(e._1, e._2)) - t.cohesion(ekey(e._1, e._2))) < 1e-9)
    }
  }

  test("surviving cohesions equal from-scratch cohesions within the truss") {
    val rnd = new Random(9)
    for (_ <- 0 until 20) {
      val n = 8
      val edges = (for (i <- 0 until n; j <- (i + 1) until n if rnd.nextDouble() < 0.5)
        yield (i, j)).toVector
      val fArr = Array.fill(n)(rnd.nextInt(11) / 10.0)
      val t = mptd(edges, fArr(_), 0.2)
      val fresh = ecoWithin(t.edges, fArr(_))
      for ((k, c) <- t.cohesion) assert(math.abs(c - fresh(k)) < 1e-9)
    }
  }

  // ----------------------------------------------------------- decomposition

  test("decompose: thresholds strictly ascending") {
    val rnd = new Random(10)
    for (_ <- 0 until 20) {
      val g = repro.TestNets.randomNet(rnd)
      val f = repro.TestNets.randomFreqs(rnd, g.n)
      val d = decompose(g.edges, f)
      val alphas = d.nodes.map(_._1)
      assert(alphas == alphas.sorted)
      assert(alphas.distinct == alphas)
    }
  }

  test("decompose: removed sets are disjoint and union to C*(0)") {
    val rnd = new Random(11)
    for (_ <- 0 until 20) {
      val g = repro.TestNets.randomNet(rnd)
      val f = repro.TestNets.randomFreqs(rnd, g.n)
      val d = decompose(g.edges, f)
      val all = d.nodes.flatMap(_._2)
      assert(all.distinct.length == all.length)
      assert(all.toSet == mptd(g.edges, f, 0.0).edges.toSet)
    }
  }

  test("Equation 1: trussAt(alpha) equals direct MPTD at alpha (random alphas)") {
    val rnd = new Random(12)
    for (_ <- 0 until 20) {
      val g = repro.TestNets.randomNet(rnd)
      val f = repro.TestNets.randomFreqs(rnd, g.n)
      val d = decompose(g.edges, f)
      for (alpha <- Seq(0.0, 0.05, 0.1, 0.25, 0.5, 1.0, 2.0)) {
        assert(d.trussAt(alpha).toSet == mptd(g.edges, f, alpha).edges.toSet,
               s"alpha=$alpha")
      }
    }
  }

  test("trussAt at exact stored thresholds honours the strict inequality") {
    val rnd = new Random(13)
    for (_ <- 0 until 10) {
      val g = repro.TestNets.randomNet(rnd)
      val f = repro.TestNets.randomFreqs(rnd, g.n)
      val d = decompose(g.edges, f)
      for ((ak, _) <- d.nodes)
        assert(d.trussAt(ak).toSet == mptd(g.edges, f, ak).edges.toSet)
    }
  }

  test("maxAlpha is the nontrivial upper bound of alpha") {
    val d = decompose(Vector((0, 1), (1, 2), (0, 2)), one)
    assert(d.maxAlpha == 1.0)
    assert(d.trussAt(d.maxAlpha).isEmpty)
    assert(d.trussAt(d.maxAlpha - 1e-6).nonEmpty)
  }

  test("Theorem 6.1: raising alpha past the min cohesion strictly shrinks the truss") {
    val rnd = new Random(14)
    var checked = 0
    while (checked < 15) {
      val g = repro.TestNets.randomNet(rnd)
      val f = repro.TestNets.randomFreqs(rnd, g.n)
      val t1 = mptd(g.edges, f, 0.0)
      if (!t1.isEmpty) {
        val beta = t1.minCohesion
        val t2 = mptd(g.edges, f, beta)
        assert(t2.edges.toSet.subsetOf(t1.edges.toSet))
        assert(t2.nEdges < t1.nEdges)
        checked += 1
      }
    }
  }

  test("decompose of an empty/triangle-free graph is empty") {
    assert(decompose(Vector.empty[(Int, Int)], one).isEmpty)
    assert(decompose(Vector((0, 1), (1, 2)), one).isEmpty)
  }

  // ------------------------------------------------------ connected components

  test("connectedComponents: single triangle is one community") {
    assert(connectedComponents(Seq((0, 1), (1, 2), (0, 2))) == Vector(Set(0, 1, 2)))
  }

  test("connectedComponents: a maximal pattern truss need not be connected") {
    // Two disjoint triangles — one maximal pattern truss, two theme communities.
    val edges = Vector((0, 1), (1, 2), (0, 2), (5, 6), (6, 7), (5, 7))
    val t = mptd(edges, one, 0.5)
    assert(t.nEdges == 6)
    val cc = connectedComponents(t.edges)
    assert(cc.toSet == Set(Set(0, 1, 2), Set(5, 6, 7)))
  }

  test("connectedComponents: ordered largest first") {
    val cc = connectedComponents(Seq((0, 1), (2, 3), (3, 4), (4, 2), (2, 5)))
    assert(cc.head == Set(2, 3, 4, 5))
  }

  test("connectedComponents of empty edge set is empty") {
    assert(connectedComponents(Nil).isEmpty)
  }
}
