package repro.jobs

import repro.harness.{Experiments, JobSession}
import repro.index.TCTree
import repro.netgen.NetGen

/** spark-submit entrypoint reproducing Figure 5: TC-Tree query performance —
  * Query-by-Alpha (q = S, ascending α_q) and Query-by-Pattern (α_q = 0,
  * patterns sampled per tree layer).
  *
  *   spark-submit --class repro.jobs.Fig5Query <jar>
  */
object Fig5Query {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig5-query")
    try {
      for (spec <- repro.harness.Experiments.benchDatasets) {
        val net = spec.gen()
        val compact = net.compact
        val tree = TCTree.build(spark, compact, maxDepth = 10)
        println(s"== Figure 5 on ${spec.name}: ${tree.nNodes} TC-Tree nodes ==")
        println("-- QBA --")
        println(Experiments.formatQba(Experiments.fig5Qba(tree, compact.items.toSet)))
        println("-- QBP --")
        println(Experiments.formatQbp(Experiments.fig5Qbp(tree)))
      }
    } finally spark.stop()
  }
}
