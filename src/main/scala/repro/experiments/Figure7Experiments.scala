package repro.experiments

import repro.core.LocalRSLPA
import repro.lfr.{LFRGenerator, LFRParams}
import repro.metrics.OverlappingNMI
import repro.slpa.LocalSLPA

/** Drivers for the paper's synthetic-data evaluation (Fig. 7a–7f):
  * NMI of rSLPA and SLPA on LFR graphs under parameter sweeps.
  *
  * Paper settings (§V-A): defaults N=10,000, k=30, maxk=100, om=2,
  * on=0.1N, μ=0.1; SLPA T=100 with τ=0.2; rSLPA T=200 with τ1/τ2 from
  * Eqs. 1–2; NMI averaged over 10 runs (we default to `runs` = 2 and
  * record the choice in EXPERIMENTS.md).
  */
object Figure7Experiments {

  /** The paper's default LFR setting (Table I text). */
  def defaults(seed: Long = 1): LFRParams =
    LFRParams(n = 10000, avgDeg = 30, maxDeg = 100, mu = 0.1,
              on = 1000, om = 2, seed = seed)

  val SlpaT = 100
  val SlpaTau = 0.2
  val RslpaT = 200

  /** Average NMI of rSLPA over `runs` independent graphs/seeds. */
  def rslpaNmi(p: LFRParams, T: Int, runs: Int, seed0: Long): Double = {
    val scores = (0 until runs).map { r =>
      val inst = LFRGenerator.generate(p.copy(seed = p.seed + 101 * r))
      val cover = LocalRSLPA.detect(inst.graph, T, seed = seed0 + 13 * r)
      OverlappingNMI.score(cover.map(_.toSet), inst.communities, inst.graph.n)
    }
    scores.sum / runs
  }

  /** Average NMI of SLPA over `runs` independent graphs/seeds. */
  def slpaNmi(p: LFRParams, runs: Int, seed0: Long): Double = {
    val scores = (0 until runs).map { r =>
      val inst = LFRGenerator.generate(p.copy(seed = p.seed + 101 * r))
      val cover = LocalSLPA.detect(inst.graph, SlpaT, SlpaTau, seed = seed0 + 17 * r)
      OverlappingNMI.score(cover.map(_.toSet), inst.communities, inst.graph.n)
    }
    scores.sum / runs
  }

  /** Fig. 7a — rSLPA convergence: NMI vs T for several N. */
  def convergence(ns: Seq[Int], ts: Seq[Int], runs: Int): Seq[(Int, Int, Double)] =
    for (n <- ns; t <- ts) yield {
      val p = defaults().copy(n = n, on = n / 10)
      (n, t, rslpaNmi(p, t, runs, seed0 = 7000 + n + t))
    }

  /** Fig. 7b–7f — one row per swept value: (value, slpaNmi, rslpaNmi). */
  def sweep(values: Seq[Double], mod: (LFRParams, Double) => LFRParams,
            runs: Int, seedBase: Long): Seq[(Double, Double, Double)] =
    values.map { v =>
      val p = mod(defaults(), v)
      val s = slpaNmi(p, runs, seedBase + (v * 100).toLong)
      val r = rslpaNmi(p, RslpaT, runs, seedBase + 50 + (v * 100).toLong)
      (v, s, r)
    }

  def vsN(ns: Seq[Int], runs: Int): Seq[(Double, Double, Double)] =
    sweep(ns.map(_.toDouble), (p, v) => p.copy(n = v.toInt, on = v.toInt / 10), runs, 100)

  def vsK(ks: Seq[Int], runs: Int): Seq[(Double, Double, Double)] =
    sweep(ks.map(_.toDouble), (p, v) => p.copy(avgDeg = v), runs, 200)

  def vsMu(mus: Seq[Double], runs: Int): Seq[(Double, Double, Double)] =
    sweep(mus, (p, v) => p.copy(mu = v), runs, 300)

  def vsOm(oms: Seq[Int], runs: Int): Seq[(Double, Double, Double)] =
    sweep(oms.map(_.toDouble), (p, v) => p.copy(om = v.toInt), runs, 400)

  def vsOn(ons: Seq[Int], runs: Int): Seq[(Double, Double, Double)] =
    sweep(ons.map(_.toDouble), (p, v) => p.copy(on = v.toInt), runs, 500)
}
