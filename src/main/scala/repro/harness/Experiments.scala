package repro.harness

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.index.TCTree
import repro.netgen.{GenNet, NetGen}

import scala.util.Random

/** Shared harness behind the `jobs/` spark-submit mains and the `bench/`
  * suites: one function per paper table/figure, each returning the printed
  * rows as data so the bench suites can assert the paper's qualitative
  * claims (orderings, monotonicity, crossovers) and EXPERIMENTS.md can diff
  * paper-vs-measured numbers.
  */
object Experiments {

  /** The four evaluation datasets of Table 2, at container scale. */
  final case class DatasetSpec(name: String, gen: () => GenNet)

  def benchDatasets: Seq[DatasetSpec] = Seq(
    DatasetSpec("BK", () => NetGen.bkLike()),
    DatasetSpec("GW", () => NetGen.gwLike()),
    DatasetSpec("AMINER", () => NetGen.aminerLike()),
    DatasetSpec("SYN", () => NetGen.synLike()),
  )

  // ---------------------------------------------------------------- Table 2

  final case class Table2Row(name: String, stats: NetworkStats)

  /** Table 2: dataset statistics computed through the DataFrame pipeline. */
  def table2(spark: SparkSession, datasets: Seq[DatasetSpec] = benchDatasets): Seq[Table2Row] =
    datasets.map(d => Table2Row(d.name, d.gen().toDF(spark).stats))

  def formatTable2(rows: Seq[Table2Row]): String = {
    val header = f"${"dataset"}%-8s ${"#Vertices"}%12s ${"#Edges"}%12s ${"#Tx"}%12s ${"#Items(tot)"}%12s ${"#Items(uniq)"}%12s"
    (header +: rows.map { r =>
      f"${r.name}%-8s ${r.stats.nVertices}%12d ${r.stats.nEdges}%12d ${r.stats.nTransactions}%12d ${r.stats.nItemsTotal}%12d ${r.stats.nItemsUnique}%12d"
    }).mkString("\n")
  }

  // ---------------------------------------------------------------- Table 3

  final case class Table3Row(name: String, indexingTimeMs: Long, memoryMB: Double, nNodes: Int, maxDepth: Int)

  private def usedHeap(): Long = {
    val rt = Runtime.getRuntime
    System.gc(); Thread.sleep(100); System.gc()
    rt.totalMemory() - rt.freeMemory()
  }

  /** Table 3: TC-Tree indexing time, approximate memory, and #nodes. */
  def table3(spark: SparkSession, datasets: Seq[DatasetSpec] = benchDatasets,
             maxDepth: Int = 10): Seq[Table3Row] =
    datasets.map { d =>
      val net = d.gen().compact
      val before = usedHeap()
      val t0 = System.nanoTime()
      val tree = TCTree.build(spark, net, maxDepth)
      val ms = (System.nanoTime() - t0) / 1000000
      val after = usedHeap()
      Table3Row(d.name, ms, math.max(0.0, (after - before) / 1e6), tree.nNodes, tree.maxDepth)
    }

  def formatTable3(rows: Seq[Table3Row]): String = {
    val header = f"${"dataset"}%-8s ${"IndexTime(ms)"}%14s ${"Memory(MB)"}%11s ${"#Nodes"}%10s ${"depth"}%6s"
    (header +: rows.map { r =>
      f"${r.name}%-8s ${r.indexingTimeMs}%14d ${r.memoryMB}%11.1f ${r.nNodes}%10d ${r.maxDepth}%6d"
    }).mkString("\n")
  }

  // ------------------------------------------------------- Figure 3 (α, ε)

  final case class MinerRow(method: String, alpha: Double, eps: Double,
                            timeMs: Long, np: Long, nv: Long, ne: Long,
                            mptdCalls: Long, pruned: Long)

  private def minerRow(method: String, alpha: Double, eps: Double, r: MiningResult): MinerRow =
    MinerRow(method, alpha, eps, r.stats.timeMs, r.np, r.nv, r.ne,
             r.stats.mptdCalls, r.stats.prunedByIntersection)

  /** Figure 3 sweep: TCS(ε) / TCFA / TCFI across cohesion thresholds α on
    * one (typically BFS-sampled) database network.
    */
  def fig3(spark: SparkSession, net: GenNet,
           alphas: Seq[Double] = Seq(0.0, 0.1, 0.2, 0.3, 0.5, 1.0, 1.5, 2.0),
           epss: Seq[Double] = Seq(0.1, 0.2, 0.3),
           maxLen: Int = 6): Seq[MinerRow] = {
    val c = net.compact
    alphas.flatMap { a =>
      epss.map(e => minerRow(s"TCS(eps=$e)", a, e, TCS.run(spark, c, a, e, maxLen))) ++
        Seq(
          minerRow("TCFA", a, Double.NaN, TCFA.run(spark, c, a, maxLen)),
          minerRow("TCFI", a, Double.NaN, TCFI.run(spark, c, a, maxLen)),
        )
    }
  }

  def formatMinerRows(rows: Seq[MinerRow]): String = {
    val header = f"${"method"}%-14s ${"alpha"}%6s ${"time(ms)"}%9s ${"NP"}%8s ${"NV"}%9s ${"NE"}%9s ${"MPTD"}%8s ${"pruned"}%8s"
    (header +: rows.map { r =>
      f"${r.method}%-14s ${r.alpha}%6.2f ${r.timeMs}%9d ${r.np}%8d ${r.nv}%9d ${r.ne}%9d ${r.mptdCalls}%8d ${r.pruned}%8d"
    }).mkString("\n")
  }

  // ------------------------------------------------- Figure 4 (scalability)

  final case class Fig4Row(method: String, mEdges: Int, timeMs: Long,
                           np: Long, nvOverNp: Double, neOverNp: Double)

  /** Figure 4: runtime and truss-size metrics vs. BFS-sampled network size,
    * at the worst case α = 0. TCS/TCFA are skipped above their cutoffs
    * (paper: "we stop reporting when they cost more than one day").
    */
  def fig4(spark: SparkSession, base: GenNet, sizes: Seq[Int],
           eps: Double = 0.1, maxLen: Int = 6,
           tcsCutoff: Int = Int.MaxValue, tcfaCutoff: Int = Int.MaxValue): Seq[Fig4Row] = {
    def row(method: String, m: Int, r: MiningResult): Fig4Row =
      Fig4Row(method, m, r.stats.timeMs, r.np,
              if (r.np == 0) 0.0 else r.nv.toDouble / r.np,
              if (r.np == 0) 0.0 else r.ne.toDouble / r.np)
    sizes.flatMap { m =>
      val net = NetGen.bfsSample(base, m).compact
      val out = scala.collection.mutable.ArrayBuffer.empty[Fig4Row]
      if (m <= tcsCutoff) out += row(s"TCS(eps=$eps)", m, TCS.run(spark, net, 0.0, eps, maxLen))
      if (m <= tcfaCutoff) out += row("TCFA", m, TCFA.run(spark, net, 0.0, maxLen))
      out += row("TCFI", m, TCFI.run(spark, net, 0.0, maxLen))
      out.toSeq
    }
  }

  def formatFig4(rows: Seq[Fig4Row]): String = {
    val header = f"${"method"}%-14s ${"edges"}%8s ${"time(ms)"}%9s ${"NP"}%8s ${"NV/NP"}%8s ${"NE/NP"}%8s"
    (header +: rows.map { r =>
      f"${r.method}%-14s ${r.mEdges}%8d ${r.timeMs}%9d ${r.np}%8d ${r.nvOverNp}%8.2f ${r.neOverNp}%8.2f"
    }).mkString("\n")
  }

  // ----------------------------------------------- Figure 5 (query answering)

  final case class QbaRow(alphaQ: Double, avgQueryMicros: Double, retrievedNodes: Int)
  final case class QbpRow(patternLen: Int, avgQueryMicros: Double, avgRetrievedNodes: Double)

  /** Figure 5(a)-(d): Query-by-Alpha with q = S, α_q ascending by 0.1 until
    * the answer is empty. Query time is averaged over `reps` runs.
    */
  def fig5Qba(tree: TCTree, allItems: Set[Int], reps: Int = 20): Seq[QbaRow] = {
    val out = Vector.newBuilder[QbaRow]
    var alphaQ = 0.0
    var rn = -1
    while (rn != 0) {
      val t0 = System.nanoTime()
      var res: repro.index.TCQueryResult = null
      var i = 0
      while (i < reps) { res = tree.queryByAlpha(allItems, alphaQ); i += 1 }
      val micros = (System.nanoTime() - t0) / 1000.0 / reps
      rn = res.retrievedNodes
      out += QbaRow(alphaQ, micros, rn)
      alphaQ = math.rint((alphaQ + 0.1) * 10) / 10
    }
    out.result()
  }

  /** Figure 5(e)-(h): Query-by-Pattern with α_q = 0, query patterns sampled
    * from each tree layer (up to `samplesPerLayer` per layer).
    */
  def fig5Qbp(tree: TCTree, samplesPerLayer: Int = 1000, reps: Int = 5,
              seed: Long = 31): Seq[QbpRow] = {
    val rnd = new Random(seed)
    (1 to tree.maxDepth).flatMap { len =>
      val layer = tree.nodesAtDepth(len)
      if (layer.isEmpty) None
      else {
        val qs = Vector.fill(math.min(samplesPerLayer, layer.length * 2))(
          layer(rnd.nextInt(layer.length)).pattern)
        val t0 = System.nanoTime()
        var rnSum = 0L
        for (_ <- 0 until reps; q <- qs) rnSum += tree.queryByPattern(q).retrievedNodes
        val micros = (System.nanoTime() - t0) / 1000.0 / (reps * qs.length)
        Some(QbpRow(len, micros, rnSum.toDouble / (reps * qs.length)))
      }
    }
  }

  def formatQba(rows: Seq[QbaRow]): String =
    (f"${"alphaQ"}%7s ${"time(us)"}%10s ${"RN"}%8s" +:
      rows.map(r => f"${r.alphaQ}%7.1f ${r.avgQueryMicros}%10.1f ${r.retrievedNodes}%8d")).mkString("\n")

  def formatQbp(rows: Seq[QbpRow]): String =
    (f"${"len"}%4s ${"time(us)"}%10s ${"avgRN"}%8s" +:
      rows.map(r => f"${r.patternLen}%4d ${r.avgQueryMicros}%10.1f ${r.avgRetrievedNodes}%8.1f")).mkString("\n")

  // --------------------------------------------- Table 4 / Fig 6 case study

  final case class CaseCommunity(keywords: Vector[String], members: Vector[String],
                                 pattern: Vector[Int], size: Int)

  /** Case study on the AMINER-like network: mine with TCFI, extract theme
    * communities, and render the largest ones with keyword/author names
    * (paper Table 4 + Figure 6). Several nested sub-patterns share one
    * member set; we keep the longest (most specific) pattern per distinct
    * member set, as the paper's Table 4 lists distinct communities.
    */
  def caseStudy(spark: SparkSession, net: GenNet, alpha: Double = 0.3,
                minPatternLen: Int = 2, top: Int = 10): Seq[CaseCommunity] = {
    val result = TCFI.run(spark, net.compact, alpha)
    result.communities
      .filter(_._1.length >= minPatternLen)
      .groupBy(_._2)
      .map { case (mem, group) =>
        val p = group.map(_._1).maxBy(q => (q.length, Pattern.key(q)))
        CaseCommunity(
          p.map(i => net.itemNames.getOrElse(i, s"item$i")),
          mem.toVector.sorted.map(v => net.vertexNames.getOrElse(v, s"v$v")),
          p, mem.size)
      }
      .toSeq
      .sortBy(c => (-c.size, c.keywords.mkString(",")))
      .take(top)
  }

  def formatCaseStudy(cs: Seq[CaseCommunity]): String =
    cs.zipWithIndex.map { case (c, i) =>
      s"p${i + 1}: {${c.keywords.mkString(", ")}}  -> community of ${c.size}: " +
        c.members.take(12).mkString(", ") + (if (c.size > 12) ", ..." else "")
    }.mkString("\n")
}
