package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed maximal-pattern-truss detection: the DataFrame analogue of
  * Algorithm 1 for a single theme network.
  *
  * Instead of the sequential queue peel, each round recomputes every edge's
  * cohesion with the Triangles pipeline and drops *all* edges with
  * eco ≤ α simultaneously, iterating to a fixed point. This converges to the
  * same maximal pattern truss: an edge of C*_p(α) has, in every intermediate
  * supergraph of C*_p(α), cohesion ≥ its cohesion inside C*_p(α) > α, so it
  * is never dropped; and the fixed point is by construction a pattern truss,
  * hence contained in the maximal one. Property tests assert agreement with
  * `LocalTruss.mptd`.
  */
object DistributedMPTD {

  /** Returns the truss edges with their final cohesions:
    * DataFrame(src, dst, eco).
    */
  def run(themeEdges: DataFrame, freqDf: DataFrame, alpha: Double): DataFrame = {
    require(alpha >= 0.0, s"alpha must be >= 0, got $alpha")
    val threshold = alpha + LocalTruss.Eps // same tie-break rule as Algorithm 1
    var edges = themeEdges.select("src", "dst").localCheckpoint(true)
    var coh = Triangles.edgeCohesion(edges, freqDf).localCheckpoint(true)
    var nBad = coh.filter(col("eco") <= threshold).count()
    while (nBad > 0 && !coh.isEmpty) {
      edges = coh.filter(col("eco") > threshold).select("src", "dst").localCheckpoint(true)
      coh = Triangles.edgeCohesion(edges, freqDf).localCheckpoint(true)
      nBad = coh.filter(col("eco") <= threshold).count()
    }
    coh
  }
}
