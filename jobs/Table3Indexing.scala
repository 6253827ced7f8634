package repro.jobs

import repro.harness.{Experiments, JobSession}

/** spark-submit entrypoint reproducing Table 3 (TC-Tree indexing
  * performance: time, memory, #nodes) on the four database networks.
  *
  *   spark-submit --class repro.jobs.Table3Indexing <jar>
  */
object Table3Indexing {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table3-indexing")
    try {
      println("== Table 3: indexing performance of TC-Tree ==")
      println(Experiments.formatTable3(Experiments.table3(spark)))
    } finally spark.stop()
  }
}
