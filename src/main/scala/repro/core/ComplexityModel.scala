package repro.core

/** The §IV-D complexity model of correction propagation: the expected
  * number η of labels needing updates after a batch of m_a insertions and
  * m_d deletions over a graph with |E| edges and |V| vertices, plus the
  * best/worst-case bounds.
  *
  * Note on Eq. 3: as printed, the second term is the probability the chosen
  * edge is *kept* ((|E|-m_d)/(|E|-m_d+m_a)), which contradicts the text
  * ("the probability of Condition (2)", the switch probability) and makes
  * p_c → 1 as batches → 0. We implement the form consistent with the
  * Category-3 analysis it cites:
  *   p_c = m_d/|E| + (1 − m_d/|E|) · m_a/(|E| − m_d + m_a),
  * which correctly vanishes for empty batches. EXPERIMENTS.md records this
  * deviation.
  */
object ComplexityModel {

  /** Probability that a single chosen edge is deleted or switched (Eq. 3,
    * corrected as described above).
    */
  def pc(numEdges: Long, mDeleted: Long, mInserted: Long): Double = {
    require(numEdges > 0 && mDeleted <= numEdges)
    val pDel = mDeleted.toDouble / numEdges
    val pSwitch = mInserted.toDouble / (numEdges - mDeleted + mInserted)
    pDel + (1.0 - pDel) * pSwitch
  }

  /** Q(t) = Π_{k=1..t} (1 − p_c / k) — probability a label picked at
    * iteration t needs no update (Eq. 7).
    */
  def qSeries(T: Int, pc: Double): Array[Double] = {
    val q = new Array[Double](T + 1)
    q(0) = 1.0
    var t = 1
    while (t <= T) { q(t) = q(t - 1) * (1.0 - pc / t); t += 1 }
    q
  }

  /** Expected η (Eq. 8): T·|V| − |V|·Σ_{t=1..T} Q(t). */
  def expectedEta(T: Int, numVertices: Long, pc: Double): Double = {
    val q = qSeries(T, pc)
    T.toDouble * numVertices - numVertices * q.drop(1).sum
  }

  /** Best-case (lower) bound on η (Eq. 10): T·|V|·p_c. */
  def bestCaseEta(T: Int, numVertices: Long, pc: Double): Double =
    T.toDouble * numVertices * pc

  /** Worst-case (upper) bound on η (Eq. 12):
    * T·|V| − |V|·(1 − p_c − (1 − p_c)^{T+1}) / p_c.
    */
  def worstCaseEta(T: Int, numVertices: Long, pc: Double): Double = {
    if (pc == 0.0) 0.0
    else T.toDouble * numVertices -
      numVertices * ((1.0 - pc) - math.pow(1.0 - pc, T + 1)) / pc
  }
}
