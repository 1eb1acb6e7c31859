package repro.jobs

import repro.experiments.Figure7Experiments._
import repro.util.BenchUtil
import repro.util.BenchUtil.f3

/** Fig. 7 (as numeric tables) — community quality (overlapping NMI) of
  * SLPA vs rSLPA on LFR graphs under the paper's parameter sweeps.
  *
  * Args: [runs] (averaging runs per point; paper uses 10, default 2)
  *       [section] (one of 7a..7f or `all`, default all).
  * Runs on the local engines (quality is independent of the execution
  * substrate — the Spark engines are tested bit-identical to them).
  */
object Figure7Job {
  def main(args: Array[String]): Unit = {
    val runs = if (args.length > 0) args(0).toInt else 2
    val section = if (args.length > 1) args(1) else "all"
    def on(s: String) = section == "all" || section == s

    if (on("7a")) {
      val rows = convergence(Seq(10000, 20000, 50000), Seq(100, 200, 400, 700, 1000), runs)
      BenchUtil.printTable("Fig. 7a — rSLPA convergence (NMI vs T)",
        Seq("N", "T", "NMI(rSLPA)"),
        rows.map { case (n, t, s) => Seq(n.toString, t.toString, f3(s)) })
    }
    if (on("7b")) {
      val rows = vsN(Seq(10000, 20000, 30000, 40000, 50000), runs)
      BenchUtil.printTable("Fig. 7b — NMI vs N", Seq("N", "NMI(SLPA)", "NMI(rSLPA)"),
        rows.map { case (v, s, r) => Seq(v.toInt.toString, f3(s), f3(r)) })
    }
    if (on("7c")) {
      val rows = vsK(Seq(10, 30, 50, 70), runs)
      BenchUtil.printTable("Fig. 7c — NMI vs average degree k",
        Seq("k", "NMI(SLPA)", "NMI(rSLPA)"),
        rows.map { case (v, s, r) => Seq(v.toInt.toString, f3(s), f3(r)) })
    }
    if (on("7d")) {
      val rows = vsMu(Seq(0.1, 0.2, 0.3), runs)
      BenchUtil.printTable("Fig. 7d — NMI vs mixing mu",
        Seq("mu", "NMI(SLPA)", "NMI(rSLPA)"),
        rows.map { case (v, s, r) => Seq(v.toString, f3(s), f3(r)) })
    }
    if (on("7e")) {
      val rows = vsOm(Seq(2, 3, 4, 5), runs)
      BenchUtil.printTable("Fig. 7e — NMI vs memberships om",
        Seq("om", "NMI(SLPA)", "NMI(rSLPA)"),
        rows.map { case (v, s, r) => Seq(v.toInt.toString, f3(s), f3(r)) })
    }
    if (on("7f")) {
      val rows = vsOn(Seq(1000, 2000, 3000), runs)
      BenchUtil.printTable("Fig. 7f — NMI vs overlapping vertices on",
        Seq("on", "NMI(SLPA)", "NMI(rSLPA)"),
        rows.map { case (v, s, r) => Seq(v.toInt.toString, f3(s), f3(r)) })
    }
  }
}
