package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** DataFrame pipeline for pattern frequencies and theme-network induction.
  *
  * f_i(p) is the fraction of transactions of d_i containing every item of p
  * (Section 3.1). The pipeline is pure Catalyst: filter the long-format
  * transaction table to the pattern's items, count distinct hits per
  * (vertex, transaction), keep full-containment transactions, and divide by
  * the per-vertex transaction count. Unit tests verify it row-for-row
  * against DuckDB and against `CompactNetwork.freq`.
  */
object Frequency {

  /** Per-vertex frequency of `pattern`: DataFrame(vertexId INT, freq DOUBLE),
    * one row for every vertex of the network (0.0 where absent).
    */
  def frequencies(net: DatabaseNetwork, pattern: Vector[Int]): DataFrame = {
    val nTx = net.transactions
      .groupBy("vertexId")
      .agg(countDistinct("txId") as "nTx")
    val base = net.vertices.select(col("id") as "vertexId").join(nTx, Seq("vertexId"), "left")
    if (pattern.isEmpty)
      return base.select(
        col("vertexId"),
        when(col("nTx").isNotNull, lit(1.0)).otherwise(lit(0.0)) as "freq",
      )
    val matched = net.transactions
      .filter(col("item").isin(pattern.map(Integer.valueOf): _*))
      .groupBy("vertexId", "txId")
      .agg(countDistinct("item") as "hits")
      .filter(col("hits") === pattern.length)
      .groupBy("vertexId")
      .agg(count(lit(1)) as "nMatch")
    base
      .join(matched, Seq("vertexId"), "left")
      .select(
        col("vertexId"),
        when(col("nTx").isNotNull,
          coalesce(col("nMatch"), lit(0L)).cast("double") / col("nTx"))
          .otherwise(lit(0.0)) as "freq",
      )
  }

  /** Theme network G_p: the edges of `edges` whose endpoints both have
    * positive frequency in `freqDf` (vertexId, freq). Output schema matches
    * `edges` (src, dst).
    */
  def themeNetwork(edges: DataFrame, freqDf: DataFrame): DataFrame = {
    val pos = freqDf.filter(col("freq") > 0.0).select(col("vertexId"))
    edges
      .join(pos.withColumnRenamed("vertexId", "src"), Seq("src"))
      .join(pos.withColumnRenamed("vertexId", "dst"), Seq("dst"))
      .select("src", "dst")
  }

  /** Per-vertex frequent-pattern enumeration used by the TCS baseline: all
    * patterns p with f_v(p) > eps for the one vertex database `db`, up to
    * `maxLen` items. Depth-first search over sorted items with tid-list
    * intersection; the frequency threshold is anti-monotone so pruning is
    * exact.
    */
  def localFrequentPatterns(db: IndexedSeq[Array[Int]], eps: Double, maxLen: Int): Vector[Vector[Int]] = {
    val nTx = db.length
    if (nTx == 0) return Vector.empty
    val tid = scala.collection.mutable.Map.empty[Int, scala.collection.mutable.ArrayBuffer[Int]]
    for ((t, ti) <- db.zipWithIndex; item <- t.distinct)
      tid.getOrElseUpdate(item, scala.collection.mutable.ArrayBuffer.empty) += ti
    val items = tid.keys.toArray.sorted
    val out = Vector.newBuilder[Vector[Int]]
    def dfs(prefix: Vector[Int], prefixTids: Array[Int], startIdx: Int): Unit = {
      var i = startIdx
      while (i < items.length) {
        val it = items(i)
        val itTids = tid(it).toArray
        val merged =
          if (prefix.isEmpty) itTids
          else {
            val b = Array.newBuilder[Int]
            var x = 0; var y = 0
            while (x < prefixTids.length && y < itTids.length) {
              if (prefixTids(x) == itTids(y)) { b += prefixTids(x); x += 1; y += 1 }
              else if (prefixTids(x) < itTids(y)) x += 1
              else y += 1
            }
            b.result()
          }
        if (merged.length.toDouble / nTx > eps) {
          val p = prefix :+ it
          out += p
          if (p.length < maxLen) dfs(p, merged, i + 1)
        }
        i += 1
      }
    }
    dfs(Vector.empty, Array.empty, 0)
    out.result()
  }
}
