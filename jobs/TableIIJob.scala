package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.{GraphGen, GraphStats}
import repro.util.BenchUtil

/** Table II — statistics of the web-graph dataset. The paper reports the
  * eu-2015-tpd crawl; we report the RMAT substitute (see DESIGN.md) next
  * to the paper's values.
  *
  * Args: [scale] [rawEdges] (defaults 16, 600000).
  */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val scale = if (args.length > 0) args(0).toInt else 16
    val rawEdges = if (args.length > 1) args(1).toLong else 600000L
    val spark = SparkSession.builder.appName("TableII").getOrCreate()
    val directed = GraphGen.rmatEdges(spark, scale, rawEdges, seed = 2015)
    val s = GraphStats.tableII(spark, directed)
    BenchUtil.printTable("Table II — web graph statistics (paper: eu-2015-tpd)",
      Seq("statistic", "paper (eu-2015-tpd)", "ours (RMAT substitute)"),
      Seq(
        Seq("# nodes", "6,650,532", s.nodes.toString),
        Seq("# edges", "170,145,510", s.edges.toString),
        Seq("avg. degree", "25.584", BenchUtil.f3(s.avgDegree)),
        Seq("max in-degree", "74,129", s.maxInDegree.toString),
        Seq("max out-degree", "398,599", s.maxOutDegree.toString),
      ))
    spark.stop()
  }
}
