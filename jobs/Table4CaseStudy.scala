package repro.jobs

import repro.harness.{Experiments, JobSession}
import repro.netgen.NetGen

/** spark-submit entrypoint reproducing the Table 4 / Figure 6 case study:
  * theme communities with named keyword sets on the AMINER-like network.
  *
  *   spark-submit --class repro.jobs.Table4CaseStudy <jar>
  */
object Table4CaseStudy {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table4-case-study")
    try {
      val net = NetGen.aminerLike()
      println("== Table 4 / Figure 6: theme communities on AMINER-like ==")
      println(Experiments.formatCaseStudy(Experiments.caseStudy(spark, net)))
    } finally spark.stop()
  }
}
