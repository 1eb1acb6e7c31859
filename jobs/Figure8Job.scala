package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.EfficiencyExperiments
import repro.util.BenchUtil
import repro.util.BenchUtil.f2

/** Fig. 8 (as a numeric table) — running time of SLPA vs rSLPA on a static
  * web graph: label propagation and post-processing measured separately.
  *
  * Args: [scale] [rawEdges] [slpaT] (defaults 15, 400000, 20; rSLPA runs
  * 2×slpaT to preserve the paper's 100:200 iteration ratio).
  */
object Figure8Job {
  def main(args: Array[String]): Unit = {
    val scale = if (args.length > 0) args(0).toInt else 15
    val rawEdges = if (args.length > 1) args(1).toLong else 400000L
    val slpaT = if (args.length > 2) args(2).toInt else 20
    val spark = SparkSession.builder.appName("Figure8").getOrCreate()
    val g = EfficiencyExperiments.webGraph(scale, rawEdges, seed = 2015)
    println(s"web-graph substitute: |V|=${g.n} |E|=${g.numEdges}")
    val rows = EfficiencyExperiments.figure8(spark, g, slpaT, seed = 8)
    BenchUtil.printTable("Fig. 8 — static running time (seconds)",
      Seq("algorithm", "iterations", "label prop (s)", "per-iter (s)", "post-proc (s)", "total (s)"),
      rows.map(r => Seq(r.algo, r.iters.toString, f2(r.propagateSec),
        f2(r.perIterSec), f2(r.postSec), f2(r.totalSec))))
    spark.stop()
  }
}
