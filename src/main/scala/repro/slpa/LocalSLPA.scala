package repro.slpa

import repro.graph.LocalGraph
import repro.util.Rng

import scala.collection.mutable

/** The baseline: Speaker–Listener Label Propagation Algorithm (Xie &
  * Szymanski, PAKDD 2012) — the algorithm rSLPA relaxes. Reference,
  * array-based implementation; [[SparkSLPA]] is tested to produce
  * bit-identical sequences under the same seed.
  *
  * Per iteration: every vertex (speaker) sends each neighbor one label
  * drawn uniformly from its own memory; every vertex (listener) appends
  * the plurality label of what it received, breaking ties uniformly.
  */
object LocalSLPA {

  /** Run `T` propagation iterations; returns per-vertex label memories of
    * length `T + 1` (position 0 is the vertex's own id).
    */
  def propagate(g: LocalGraph, T: Int, seed: Long): Array[Array[Long]] = {
    val labels = Array.tabulate(g.n)(i => {
      val a = new Array[Long](T + 1); a(0) = i.toLong; a
    })
    var t = 1
    while (t <= T) {
      // All sends in iteration t read memories of length t (simultaneity).
      val inbox = Array.fill(g.n)(mutable.ArrayBuffer.empty[Long])
      var j = 0
      while (j < g.n) {
        val rng = Rng.forVertex(seed, j.toLong, t, Rng.SaltSend)
        val nbrs = g.adj(j) // sorted — draw order is deterministic
        var k = 0
        while (k < nbrs.length) {
          inbox(nbrs(k)) += labels(j)(rng.nextInt(t))
          k += 1
        }
        j += 1
      }
      var i = 0
      while (i < g.n) {
        labels(i)(t) = selectLabel(i.toLong, t, inbox(i).toSeq, seed)
        i += 1
      }
      t += 1
    }
    labels
  }

  /** Plurality with uniform tie-break over the sorted set of argmax labels.
    * A vertex with no messages (degree 0) keeps its own id.
    */
  def selectLabel(vid: Long, t: Int, received: Seq[Long], seed: Long): Long = {
    if (received.isEmpty) vid
    else {
      val counts = received.groupBy(identity).view.mapValues(_.size)
      val maxC = counts.values.max
      val candidates = counts.collect { case (l, c) if c == maxC => l }.toArray.sorted
      if (candidates.length == 1) candidates(0)
      else {
        val rng = Rng.forVertex(seed, vid, t, Rng.SaltTie)
        candidates(rng.nextInt(candidates.length))
      }
    }
  }

  /** SLPA post-processing: keep labels whose frequency in the memory is at
    * least `tau` (fallback: the most frequent label); a community is the
    * vertex set sharing a retained label; drop singletons, exact
    * duplicates, and communities nested in another (standard SLPA
    * post-processing).
    */
  def threshold(labels: Array[Array[Long]], tau: Double): Vector[Set[Int]] = {
    val n = labels.length
    val byLabel = mutable.HashMap.empty[Long, mutable.HashSet[Int]]
    var i = 0
    while (i < n) {
      val mem = labels(i)
      val counts = mem.groupBy(identity).view.mapValues(_.length).toMap
      val kept0 = counts.filter { case (_, c) => c.toDouble / mem.length >= tau }.keys
      val kept = if (kept0.isEmpty) Seq(counts.maxBy { case (l, c) => (c, -l) }._1) else kept0.toSeq
      kept.foreach(l => byLabel.getOrElseUpdate(l, mutable.HashSet.empty) += i)
      i += 1
    }
    val raw = byLabel.values.map(_.toSet).filter(_.size >= 2).toVector.distinct
    // Remove communities fully contained in another.
    raw.filterNot(c => raw.exists(o => (o ne c) && c.subsetOf(o) && o.size > c.size))
  }

  /** Full pipeline: propagate then threshold. */
  def detect(g: LocalGraph, T: Int, tau: Double, seed: Long): Vector[Set[Int]] =
    threshold(propagate(g, T, seed), tau)
}
