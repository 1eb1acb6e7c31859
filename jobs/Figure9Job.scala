package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.EfficiencyExperiments
import repro.util.BenchUtil
import repro.util.BenchUtil.f2

/** Fig. 9 (as a numeric table) — running time of rSLPA incremental
  * updating vs re-running from scratch, for different edit-batch sizes
  * (half insertions / half deletions, uniformly random).
  *
  * Args: [scale] [rawEdges] [T] [batchSizes...] (defaults 15, 400000, 40,
  * 100 1000 10000 — the paper's 100..100K scaled by ~1/10 to our |E|).
  */
object Figure9Job {
  def main(args: Array[String]): Unit = {
    val scale = if (args.length > 0) args(0).toInt else 15
    val rawEdges = if (args.length > 1) args(1).toLong else 400000L
    val t = if (args.length > 2) args(2).toInt else 40
    val batches = if (args.length > 3) args.drop(3).map(_.toInt).toSeq else Seq(100, 1000, 10000)
    val spark = SparkSession.builder.appName("Figure9").getOrCreate()
    val g = EfficiencyExperiments.webGraph(scale, rawEdges, seed = 2015)
    println(s"web-graph substitute: |V|=${g.n} |E|=${g.numEdges}")
    val rows = EfficiencyExperiments.figure9(spark, g, t, seed = 9, batches)
    BenchUtil.printTable("Fig. 9 — incremental vs from-scratch (seconds)",
      Seq("batch", "incremental (s)", "scratch (s)", "speedup", "repicked", "corrected"),
      rows.map(r => Seq(r.batchSize.toString, f2(r.incrementalSec), f2(r.scratchSec),
        f2(r.scratchSec / r.incrementalSec), r.repicked.toString, r.corrected.toString)))
    spark.stop()
  }
}
