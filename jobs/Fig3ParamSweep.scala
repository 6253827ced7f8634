package repro.jobs

import repro.harness.{Experiments, JobSession}
import repro.netgen.NetGen

/** spark-submit entrypoint reproducing the Figure 3 sweep: effect of the
  * cohesion threshold α and the TCS frequency threshold ε on time/NP/NV/NE,
  * on BFS-sampled BK/GW/AMINER-like networks (paper: 10k/10k/5k edges;
  * here scaled with the datasets).
  *
  *   spark-submit --class repro.jobs.Fig3ParamSweep <jar>
  */
object Fig3ParamSweep {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig3-param-sweep")
    try {
      val samples = Seq(
        ("BK", NetGen.bfsSample(NetGen.bkLike(), 2000)),
        ("GW", NetGen.bfsSample(NetGen.gwLike(), 2000)),
        ("AMINER", NetGen.bfsSample(NetGen.aminerLike(), 1000)),
      )
      for ((name, net) <- samples) {
        println(s"== Figure 3 sweep on $name (sampled ${net.nEdges} edges) ==")
        println(Experiments.formatMinerRows(Experiments.fig3(spark, net)))
      }
    } finally spark.stop()
  }
}
