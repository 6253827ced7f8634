package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** DataFrame pipeline for triangle enumeration and edge cohesion
  * (Definition 3.1). Works on canonical (src < dst) edge tables, so every
  * triangle is produced exactly once as (a < b < c).
  */
object Triangles {

  /** All triangles of the canonical edge table: DataFrame(a, b, c), a<b<c.
    * Two self-joins: (a,b) ⨝ (b,c) gives wedges a<b<c; closing edge (a,c)
    * must exist.
    */
  def triangles(edges: DataFrame): DataFrame = {
    val e1 = edges.select(col("src") as "a", col("dst") as "b")
    val e2 = edges.select(col("src") as "b", col("dst") as "c")
    val e3 = edges.select(col("src") as "a", col("dst") as "c")
    e1.join(e2, Seq("b")).join(e3, Seq("a", "c")).select("a", "b", "c")
  }

  /** Edge cohesion of every edge of the subgraph `edges` given vertex
    * frequencies `freqDf(vertexId, freq)`:
    *
    *   eco(e) = Σ over triangles containing e of min(f_a, f_b, f_c)
    *
    * Output: DataFrame(src, dst, eco DOUBLE) covering *all* input edges
    * (0.0 for triangle-free edges).
    */
  def edgeCohesion(edges: DataFrame, freqDf: DataFrame): DataFrame = {
    val tri = triangles(edges)
    def f(alias: String, vcol: String) =
      freqDf.select(col("vertexId") as vcol, col("freq") as alias)
    val withMin = tri
      .join(f("fa", "a"), Seq("a"))
      .join(f("fb", "b"), Seq("b"))
      .join(f("fc", "c"), Seq("c"))
      .select(col("a"), col("b"), col("c"),
              least(col("fa"), col("fb"), col("fc")) as "m")
    val contrib = withMin.select(col("a") as "src", col("b") as "dst", col("m"))
      .unionAll(withMin.select(col("a") as "src", col("c") as "dst", col("m")))
      .unionAll(withMin.select(col("b") as "src", col("c") as "dst", col("m")))
    val sums = contrib.groupBy("src", "dst").agg(sum("m") as "ecoSum")
    edges
      .join(sums, Seq("src", "dst"), "left")
      .select(col("src"), col("dst"), coalesce(col("ecoSum"), lit(0.0)) as "eco")
  }
}
