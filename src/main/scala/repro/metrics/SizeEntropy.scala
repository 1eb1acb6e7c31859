package repro.metrics

/** Information entropy of relative community sizes (paper Eq. 1):
  *   entropy = - Σ_i (|C_i|/|V|) log(|C_i|/|V|)
  * used by rSLPA post-processing to select τ1 — the threshold that yields
  * neither a dust of micro-communities nor one giant component.
  */
object SizeEntropy {
  def of(sizes: Seq[Int], n: Int): Double = {
    require(n > 0)
    sizes.iterator.filter(_ > 0).map { s =>
      val p = s.toDouble / n
      -p * math.log(p)
    }.sum
  }
}
