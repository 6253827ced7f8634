package repro.core

import repro.{SparkSpec, TestNets}

import scala.util.Random

/** TCS / TCFA / TCFI: exactness (TCFA ≡ TCFI), the TCS accuracy trade-off,
  * the paper's anti-monotonicity properties on mined results, and recovery
  * of planted theme communities.
  */
class MinersSuite extends SparkSpec {

  private def assertSameResults(a: MiningResult, b: MiningResult): Unit = {
    assert(a.trusses.keySet == b.trusses.keySet,
      s"pattern sets differ: only-a=${a.trusses.keySet -- b.trusses.keySet} " +
        s"only-b=${b.trusses.keySet -- a.trusses.keySet}")
    for ((p, ta) <- a.trusses) {
      val tb = b.trusses(p)
      assert(ta.edges.toSet == tb.edges.toSet, s"edges differ for ${Pattern.key(p)}")
      for (e <- ta.edges) {
        val k = LocalTruss.ekey(e._1, e._2)
        assert(math.abs(ta.cohesion(k) - tb.cohesion(k)) < 1e-9)
      }
    }
  }

  // ------------------------------------------------------------ tiny network

  test("TCFA on the triangle net finds {0}, {1}, {0,1} at alpha = 0.4") {
    val c = TestNets.triangleNet.compact
    val r = TCFA.run(spark, c, 0.4)
    assert(r.trusses.keySet == Set(Vector(0), Vector(1), Vector(0, 1)))
    assert(r.trusses.values.forall(_.nEdges == 3))
  }

  test("strict threshold: eco = 0.5 does not survive alpha = 0.5") {
    val c = TestNets.triangleNet.compact
    val r = TCFA.run(spark, c, 0.5)
    assert(r.trusses.keySet == Set(Vector(0)))
  }

  test("alpha above every cohesion yields no theme communities") {
    val c = TestNets.triangleNet.compact
    assert(TCFA.run(spark, c, 5.0).trusses.isEmpty)
    assert(TCFI.run(spark, c, 5.0).trusses.isEmpty)
  }

  test("TCS with low eps equals TCFA on the triangle net") {
    val c = TestNets.triangleNet.compact
    assertSameResults(TCS.run(spark, c, 0.4, eps = 0.1), TCFA.run(spark, c, 0.4))
  }

  test("TCS with high eps loses the low-frequency pattern (trade-off)") {
    val c = TestNets.triangleNet.compact
    // f({1}) = f({0,1}) = 0.5 on every vertex: eps = 0.6 filters them out.
    val r = TCS.run(spark, c, 0.4, eps = 0.6)
    assert(r.trusses.keySet == Set(Vector(0)))
  }

  // ------------------------------------------------------ exactness at scale

  test("TCFA and TCFI produce identical results on the planted network (alpha sweep)") {
    val c = TestNets.smallPlanted().compact
    for (alpha <- Seq(0.0, 0.2, 0.5)) {
      assertSameResults(TCFA.run(spark, c, alpha, maxLen = 4),
                        TCFI.run(spark, c, alpha, maxLen = 4))
    }
  }

  test("TCFA and TCFI agree on random database networks") {
    val rnd = new Random(51)
    for (_ <- 0 until 3) {
      val g = TestNets.randomNet(rnd, maxN = 10)
      val c = g.compact
      assertSameResults(TCFA.run(spark, c, 0.1, maxLen = 4),
                        TCFI.run(spark, c, 0.1, maxLen = 4))
    }
  }

  test("TCS results are always a subset of the exact results, with equal trusses") {
    val c = TestNets.smallPlanted().compact
    val exact = TCFI.run(spark, c, 0.2, maxLen = 4)
    val tcs = TCS.run(spark, c, 0.2, eps = 0.2, maxLen = 4)
    assert(tcs.trusses.keySet.subsetOf(exact.trusses.keySet))
    for ((p, t) <- tcs.trusses)
      assert(t.edges.toSet == exact.trusses(p).edges.toSet, Pattern.key(p))
  }

  test("lowering eps can only grow the TCS result set") {
    val c = TestNets.smallPlanted().compact
    val loose = TCS.run(spark, c, 0.2, eps = 0.1, maxLen = 4)
    val tight = TCS.run(spark, c, 0.2, eps = 0.3, maxLen = 4)
    assert(tight.trusses.keySet.subsetOf(loose.trusses.keySet))
  }

  // ---------------------------------------------------- mined-result theory

  test("Proposition 5.2 on results: every sub-pattern of a qualified pattern is qualified") {
    val c = TestNets.smallPlanted().compact
    val r = TCFI.run(spark, c, 0.1, maxLen = 4)
    for (p <- r.trusses.keys if p.length > 1; sub <- Pattern.subPatternsDropOne(p))
      assert(r.trusses.contains(sub), s"${Pattern.key(p)} qualified but ${Pattern.key(sub)} missing")
  }

  test("Theorem 5.1 on results: trusses shrink as patterns grow") {
    val c = TestNets.smallPlanted().compact
    val r = TCFI.run(spark, c, 0.1, maxLen = 4)
    for (p <- r.trusses.keys if p.length > 1; sub <- Pattern.subPatternsDropOne(p)) {
      val big = r.trusses(sub).edges.toSet
      assert(r.trusses(p).edges.toSet.subsetOf(big))
    }
  }

  test("Proposition 5.3 on results: truss of a union lies in the intersection") {
    val c = TestNets.smallPlanted().compact
    val r = TCFI.run(spark, c, 0.1, maxLen = 4)
    for (p <- r.trusses.keys if p.length == 2) {
      val inter = r.trusses(Vector(p(0))).edges.toSet intersect r.trusses(Vector(p(1))).edges.toSet
      assert(r.trusses(p).edges.toSet.subsetOf(inter))
    }
  }

  // ----------------------------------------------------------- planted truth

  test("TCFI recovers planted favourite patterns as theme communities") {
    val g = TestNets.smallPlanted()
    val r = TCFI.run(spark, g.compact, 0.1, maxLen = 4)
    val planted = g.groundTruth.filter(_._1.length >= 2)
    val recovered = planted.count { case (p, members) =>
      r.trusses.get(p).exists(t => (t.vertices intersect members).size >= 3)
    }
    assert(recovered * 2 >= planted.size,
      s"recovered only $recovered of ${planted.size} planted patterns")
  }

  test("mined communities overlap strongly with their planted groups") {
    val g = TestNets.smallPlanted()
    val r = TCFI.run(spark, g.compact, 0.1, maxLen = 4)
    val gt = g.groundTruth.toMap
    val full = r.communities.filter { case (p, _) => gt.contains(p) && p.length >= 2 }
    assert(full.nonEmpty)
    val good = full.count { case (p, mem) => (mem intersect gt(p)).size >= mem.size / 2 }
    assert(good * 2 >= full.size)
  }

  // --------------------------------------------------------- stats/counters

  test("NP equals the number of trusses; NV/NE aggregate over trusses") {
    val c = TestNets.triangleNet.compact
    val r = TCFA.run(spark, c, 0.4)
    assert(r.np == 3)
    assert(r.nv == 9) // 3 trusses x 3 vertices each (counted per truss)
    assert(r.ne == 9)
  }

  test("TCFI never runs more MPTD calls than TCFA") {
    val c = TestNets.smallPlanted().compact
    val fa = TCFA.run(spark, c, 0.1, maxLen = 4)
    val fi = TCFI.run(spark, c, 0.1, maxLen = 4)
    assert(fi.stats.mptdCalls <= fa.stats.mptdCalls)
    assert(fi.stats.mptdCalls + fi.stats.prunedByIntersection == fa.stats.mptdCalls)
  }

  test("candidate counters: examined candidates bound MPTD calls") {
    val c = TestNets.smallPlanted().compact
    val fi = TCFI.run(spark, c, 0.2, maxLen = 4)
    assert(fi.stats.mptdCalls <= fi.stats.candidates)
    assert(fi.stats.timeMs >= 0)
  }

  test("maxLen caps the pattern length in results") {
    val c = TestNets.smallPlanted().compact
    val r = TCFI.run(spark, c, 0.0, maxLen = 2)
    assert(r.trusses.keys.forall(_.length <= 2))
  }

  test("communities partition each truss's vertices") {
    val c = TestNets.smallPlanted().compact
    val r = TCFI.run(spark, c, 0.2, maxLen = 3)
    val byPattern = r.communities.groupBy(_._1)
    for ((p, t) <- r.trusses) {
      val comms = byPattern(p).map(_._2)
      assert(comms.map(_.size).sum == t.nVertices)
      assert(comms.reduce(_ ++ _) == t.vertices)
    }
  }
}
