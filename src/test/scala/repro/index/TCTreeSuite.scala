package repro.index

import repro.core._
import repro.{SparkSpec, TestNets}

/** TC-Tree construction (Algorithm 4) and query answering (Algorithm 5)
  * against direct mining with TCFA/TCFI and direct MPTD recomputation.
  */
class TCTreeSuite extends SparkSpec {

  private lazy val triTree = TCTree.build(spark, TestNets.triangleNet.compact)
  private lazy val plantedNet = TestNets.smallPlanted()
  private lazy val plantedCompact = plantedNet.compact
  private lazy val plantedTree = TCTree.build(spark, plantedCompact, maxDepth = 4)
  private lazy val plantedExact = TCFI.run(spark, plantedCompact, 0.0, maxLen = 4)

  test("triangle net: nodes are exactly {0}, {1}, {0,1}") {
    assert(triTree.nodes.map(_.pattern).toSet ==
      Set(Vector(0), Vector(1), Vector(0, 1)))
    assert(triTree.nNodes == 3)
  }

  test("triangle net: SE-tree structure — {0,1} is a child of {0}, not of {1}") {
    val n0 = triTree.root.children.find(_.item == 0).get
    val n1 = triTree.root.children.find(_.item == 1).get
    assert(n0.children.map(_.pattern) == Seq(Vector(0, 1)))
    assert(n1.children.isEmpty)
  }

  test("triangle net: stored decompositions match direct decomposition") {
    val c = TestNets.triangleNet.compact
    for (node <- triTree.nodes) {
      val f = MinerOps.freqFn(c, node.pattern)
      val direct = LocalTruss.decompose(LocalTruss.themeInduce(c.edgeList, f), f)
      assert(node.decomp.nodes.map(_._1) == direct.nodes.map(_._1))
      assert(node.decomp.nodes.map(_._2.toSet) == direct.nodes.map(_._2.toSet))
    }
  }

  test("every node stores a non-empty decomposition (empty subtrees pruned)") {
    assert(plantedTree.nodes.forall(!_.decomp.isEmpty))
  }

  test("node patterns equal the exact qualified patterns at alpha = 0") {
    assert(plantedTree.nodes.map(_.pattern).toSet == plantedExact.trusses.keySet)
  }

  test("trussAt(0) of every node equals the mined maximal pattern truss") {
    for (node <- plantedTree.nodes) {
      assert(node.trussAt(0.0).toSet == plantedExact.trusses(node.pattern).edges.toSet,
             Pattern.key(node.pattern))
    }
  }

  test("children items are strictly larger than the parent's item (order ≺)") {
    def walk(n: TCNode): Unit = {
      for (c <- n.children) {
        if (n.item >= 0) assert(c.item > n.item)
        assert(c.pattern == n.pattern :+ c.item)
        walk(c)
      }
    }
    walk(plantedTree.root)
  }

  test("QBA: query with q = S at alpha matches direct mining at alpha") {
    val allItems = plantedCompact.items.toSet
    for (alpha <- Seq(0.0, 0.1, 0.3)) {
      val qr = plantedTree.queryByAlpha(allItems, alpha)
      val direct = TCFI.run(spark, plantedCompact, alpha, maxLen = 4)
      val got = qr.results.toMap
      assert(got.keySet == direct.trusses.keySet, s"alpha=$alpha")
      for ((p, es) <- got)
        assert(es.toSet == direct.trusses(p).edges.toSet, s"alpha=$alpha p=${Pattern.key(p)}")
    }
  }

  test("QBA: retrieved nodes decrease as alpha_q grows") {
    val allItems = plantedCompact.items.toSet
    val rns = Seq(0.0, 0.2, 0.5, 1.0).map(a => plantedTree.queryByAlpha(allItems, a).retrievedNodes)
    assert(rns == rns.sorted.reverse)
  }

  test("QBA at alphaStar returns nothing; just below it returns something") {
    val allItems = plantedCompact.items.toSet
    val aStar = plantedTree.alphaStar
    assert(plantedTree.queryByAlpha(allItems, aStar).retrievedNodes == 0)
    assert(plantedTree.queryByAlpha(allItems, aStar - 1e-6).retrievedNodes > 0)
  }

  test("QBP: returns exactly the stored sub-patterns of the query pattern") {
    val deepest = plantedTree.nodes.maxBy(_.pattern.length)
    val qr = plantedTree.queryByPattern(deepest.pattern)
    val expected = plantedTree.nodes.map(_.pattern)
      .filter(p => Pattern.isSubPattern(p, deepest.pattern)).toSet
    assert(qr.results.map(_._1).toSet == expected)
  }

  test("QBP: querying a single item returns at most that one node") {
    val item = plantedTree.root.children.head.item
    val qr = plantedTree.queryByPattern(Vector(item))
    assert(qr.results.map(_._1) == Vector(Vector(item)))
  }

  test("QBP with an item absent from the tree returns nothing") {
    assert(plantedTree.queryByPattern(Vector(10 * 1000 * 1000)).retrievedNodes == 0)
  }

  test("query(q, alpha) equals Equation 1 on every matching node (combined)") {
    val someNode = plantedTree.nodes.maxBy(_.pattern.length)
    val alpha = 0.15
    val qr = plantedTree.query(someNode.pattern.toSet, alpha)
    val expected = plantedTree.nodes
      .filter(n => Pattern.isSubPattern(n.pattern, someNode.pattern))
      .map(n => (n.pattern, n.trussAt(alpha)))
      .filter(_._2.nonEmpty)
      .toMap
    assert(qr.results.toMap.view.mapValues(_.toSet).toMap ==
      expected.view.mapValues(_.toSet).toMap)
  }

  test("query communities are maximal connected subgraphs of retrieved trusses") {
    val qr = plantedTree.queryByAlpha(plantedCompact.items.toSet, 0.1)
    for ((p, es) <- qr.results.take(5)) {
      val cc = LocalTruss.connectedComponents(es)
      val allV = es.flatMap(e => Seq(e._1, e._2)).toSet
      assert(cc.map(_.size).sum == allV.size, Pattern.key(p))
    }
  }

  test("maxDepth = 1 keeps only single-item nodes") {
    val shallow = TCTree.build(spark, plantedCompact, maxDepth = 1)
    assert(shallow.nodes.forall(_.pattern.length == 1))
    assert(shallow.nodes.map(_.pattern).toSet ==
      plantedExact.trusses.keySet.filter(_.length == 1))
  }

  test("nodesAtDepth partitions the nodes by pattern length") {
    val byDepth = (1 to plantedTree.maxDepth).map(d => plantedTree.nodesAtDepth(d).length).sum
    assert(byDepth == plantedTree.nNodes)
  }

  test("tree of an edgeless network is empty") {
    val g = repro.netgen.GenNet(3, Vector.empty, Vector.fill(3)(Vector(Vector(0))))
    val t = TCTree.build(spark, g.compact)
    assert(t.nNodes == 0)
    assert(t.alphaStar == 0.0)
  }
}
