package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite generators and the DuckDB
  * oracle plumbing (the paper's own evaluation runs on the netgen networks;
  * this guards the shared Spark/DuckDB infrastructure).
  */
class SynthDataSuite extends SparkSpec {

  test("lineitem row count scales with sf and is deterministic in the seed") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 1)
    assert(a.count() == 6000)
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 1)
    assert(a.exceptAll(b).isEmpty)
  }

  test("aggregation query over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001, seed = 2)
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", sum("l_quantity") as "qty")
      .select(col("l_returnflag"), col("cnt"), col("qty"))
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag,
        |       COUNT(*) AS cnt,
        |       SUM(CAST(l_quantity AS DOUBLE)) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li,
    )
  }

  test("orders/customer keys are dense 1..N") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.count() == 1500)
    val mm = o.agg(min("o_orderkey"), max("o_orderkey")).head()
    assert(mm.getLong(0) == 1 && mm.getLong(1) == 1500)
  }

  test("zipfKeys is skewed, uniformKeys is not") {
    val z = SynthData.zipfKeys(spark, 20000, 100)
      .groupBy("k").count().orderBy(desc("count")).head()
    val u = SynthData.uniformKeys(spark, 20000, 100)
      .groupBy("k").count().orderBy(desc("count")).head()
    assert(z.getLong(1) > 3 * u.getLong(1), s"zipf top=${z.getLong(1)} uniform top=${u.getLong(1)}")
  }
}
