package repro.netgen

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** Generators: determinism, structural validity, planted-pattern strength,
  * the SYN recipe's degree-driven database sizes, and BFS sampling.
  */
class NetGenSuite extends SparkSpec {

  private def validate(g: GenNet): Unit = {
    assert(g.txs.length == g.n)
    for ((u, v) <- g.edges) {
      assert(u < v, s"non-canonical edge ($u,$v)")
      assert(u >= 0 && v < g.n)
    }
    assert(g.edges.distinct.length == g.edges.length)
    assert(g.txs.forall(_.nonEmpty), "every vertex must carry a database")
    assert(g.txs.forall(_.forall(_.nonEmpty)), "transactions must be non-empty")
  }

  test("bkLike is deterministic in its seed") {
    val a = NetGen.bkLike(300, seed = 5)
    val b = NetGen.bkLike(300, seed = 5)
    assert(a.edges == b.edges && a.txs == b.txs)
    val c = NetGen.bkLike(300, seed = 6)
    assert(a.edges != c.edges || a.txs != c.txs)
  }

  test("gwLike / aminerLike / synLike are deterministic in their seeds") {
    assert(NetGen.gwLike(300, seed = 5).edges == NetGen.gwLike(300, seed = 5).edges)
    assert(NetGen.aminerLike(200, 10, 50, seed = 5).edges ==
           NetGen.aminerLike(200, 10, 50, seed = 5).edges)
    assert(NetGen.synLike(300, seed = 5).edges == NetGen.synLike(300, seed = 5).edges)
  }

  test("all four generators produce structurally valid networks") {
    validate(NetGen.bkLike(300, seed = 1))
    validate(NetGen.gwLike(300, seed = 1))
    validate(NetGen.aminerLike(200, 10, 50, seed = 1))
    validate(NetGen.synLike(300, seed = 1))
  }

  test("GW-like is denser than BK-like (paper Table 2 ordering)") {
    val bk = NetGen.bkLike(600, seed = 2)
    val gw = NetGen.gwLike(600, seed = 2)
    assert(gw.nEdges.toDouble / gw.n > bk.nEdges.toDouble / bk.n)
  }

  test("checkin groups: favourite pattern is genuinely frequent on members") {
    val g = NetGen.bkLike(400, seed = 3)
    val c = g.compact
    val strong = g.groundTruth.count { case (p, members) =>
      val f = members.toSeq.map(c.freq(_, p))
      f.sum / f.size > 0.2
    }
    assert(strong * 2 >= g.groundTruth.size)
  }

  test("aminer: topic keywords frequent on group members, groups are wired") {
    val g = NetGen.aminerLike(200, 10, 50, seed = 4)
    val c = g.compact
    val adj = c.adj
    for ((p, members) <- g.groundTruth.take(5)) {
      val f = members.toSeq.map(c.freq(_, p))
      assert(f.max > 0.2, s"pattern $p never frequent")
      val ms = members.toSeq
      val internal = (for (i <- ms.indices; j <- (i + 1) until ms.length
                           if adj(ms(i)).contains(ms(j))) yield 1).sum
      assert(internal >= ms.length - 1, "group should be densely connected")
    }
  }

  test("synLike follows the degree-driven database-size recipe") {
    val g = NetGen.synLike(300, seed = 6)
    val deg = Array.fill(g.n)(0)
    g.edges.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    for (v <- 0 until g.n) {
      val expectTx = math.min(25, math.ceil(math.exp(0.10 * deg(v))).toInt)
      assert(g.txs(v).length == expectTx, s"v=$v deg=${deg(v)}")
      val expectLen = math.min(8, math.max(1, math.ceil(math.exp(0.13 * deg(v))).toInt))
      assert(g.txs(v).forall(_.length <= expectLen))
    }
  }

  test("synLike degrees are skewed (preferential attachment)") {
    val g = NetGen.synLike(500, seed = 7)
    val deg = Array.fill(g.n)(0)
    g.edges.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    assert(deg.max > 3 * (2.0 * g.nEdges / g.n), "expected a heavy-tail hub")
  }

  test("bfsSample returns exactly the requested edge count") {
    val g = NetGen.bkLike(400, seed = 8)
    val s = NetGen.bfsSample(g, 200)
    assert(s.nEdges == 200)
    validate(s)
  }

  test("bfsSample with m >= |E| returns the original network") {
    val g = NetGen.bkLike(200, seed = 9)
    assert(NetGen.bfsSample(g, g.nEdges + 10) eq g)
  }

  test("bfsSample is deterministic and remaps ground truth consistently") {
    val g = NetGen.bkLike(400, seed = 10)
    val a = NetGen.bfsSample(g, 300, seed = 1)
    val b = NetGen.bfsSample(g, 300, seed = 1)
    assert(a.edges == b.edges && a.txs == b.txs)
    for ((_, members) <- a.groundTruth; m <- members) assert(m >= 0 && m < a.n)
  }

  test("toDF/compact agree with each other on vertex, edge and tx counts") {
    val g = NetGen.aminerLike(100, 6, 40, seed = 11)
    val df = g.toDF(spark)
    val c = g.compact
    assert(df.vertices.count() == c.n)
    assert(df.edges.count() == c.nEdges)
    val s = df.stats
    assert(s.nTransactions == g.txs.map(_.size).sum)
    assert(s.nItemsTotal == g.txs.map(_.map(_.distinct.size).sum).sum)
  }

  test("Table 2 statistics match DuckDB over the transactions table") {
    val g = NetGen.bkLike(150, seed = 12)
    val net = g.toDF(spark)
    val sparkStats = net.transactions.agg(
      countDistinct(concat_ws("|", col("vertexId"), col("txId"))) as "nTx",
      count(lit(1)) as "itemsTotal",
      countDistinct(col("item")) as "itemsUnique",
    )
    Oracle.assertEquivalent(
      sparkStats,
      """SELECT COUNT(DISTINCT vertexId || '|' || txId) AS nTx,
        |       COUNT(*) AS itemsTotal,
        |       COUNT(DISTINCT item) AS itemsUnique
        |FROM transactions""".stripMargin,
      "transactions" -> net.transactions,
    )
  }

  test("stats helper equals the raw aggregation") {
    val g = NetGen.gwLike(150, seed = 13)
    val net = g.toDF(spark)
    val s = net.stats
    assert(s.nVertices == g.n)
    assert(s.nEdges == g.nEdges)
    assert(s.nItemsUnique == g.txs.flatMap(_.flatten).distinct.size)
  }
}
