package repro.jobs

import repro.experiments.Figure7Experiments
import repro.lfr.LFRGenerator
import repro.util.BenchUtil

/** Table I — the LFR benchmark parameters (and a verification that the
  * generated graph honors them). Run: `spark-submit --class repro.jobs.TableIJob ...`
  * (pure generator; Spark is not needed but the entrypoint is uniform).
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val p = Figure7Experiments.defaults()
    BenchUtil.printTable("Table I — LFR parameters (paper defaults)",
      Seq("parameter", "description", "value"),
      Seq(
        Seq("N", "the number of vertices", p.n.toString),
        Seq("maxk", "the max degree", p.maxDeg.toString),
        Seq("k", "the average degree", p.avgDeg.toString),
        Seq("mu", "the mixing parameter", p.mu.toString),
        Seq("on", "the number of overlapping vertices", p.on.toString),
        Seq("om", "memberships of overlapping vertices", p.om.toString),
      ))
    val inst = LFRGenerator.generate(p)
    val avg = 2.0 * inst.graph.numEdges / inst.graph.n
    val maxDeg = (0 until inst.graph.n).map(inst.graph.degree).max
    val multi = inst.membershipOf.count(_.size >= 2)
    BenchUtil.printTable("Generated graph vs Table I targets",
      Seq("statistic", "target", "generated"),
      Seq(
        Seq("vertices", p.n.toString, inst.graph.n.toString),
        Seq("avg degree", p.avgDeg.toString, BenchUtil.f2(avg)),
        Seq("max degree", s"<= ${p.maxDeg}", maxDeg.toString),
        Seq("overlapping vertices", p.on.toString, multi.toString),
      ))
  }
}
