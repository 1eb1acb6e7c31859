package repro.core

import repro.graph.LocalGraph

import scala.collection.mutable

/** Outcome of one incremental update: counts used by the complexity
  * benches (η of §IV-D).
  *
  * @param repicked  labels whose (src, pos) was re-picked (Categories 2/3)
  * @param corrected labels whose *value* changed (repick or downstream
  *                  correction) — the paper's η
  * @param rounds    correction-propagation rounds until quiescence
  */
final case class UpdateStats(repicked: Long, corrected: Long, touched: Long, rounds: Int)

/** Incremental updating of an rSLPA propagation state after a batch of
  * edge insertions/deletions (Algorithm 2, "Correction Propagation").
  *
  * Phase 1 — adjacent edge changes (§IV-A): classify every vertex by how
  * its neighborhood changed and keep every pick that can still be regarded
  * as uniform on the new graph:
  *  - Category 1 (unchanged neighborhood): keep everything;
  *  - Category 2 (only lost neighbors): re-pick only picks whose source
  *    edge was deleted (Theorem 4);
  *  - Category 3 (gained neighbors): if the source survives, keep it with
  *    probability n_u / (n_u + n_a), otherwise re-pick uniformly among the
  *    *new* neighbors (Theorem 5); if the source was deleted, re-pick
  *    uniformly among all current neighbors.
  *
  * Phase 2 — subsequent updates (§IV-B): changed label values are pushed
  * along the reverse receiver records R; a change at position t can only
  * trigger changes at positions > t, so processing corrections in
  * ascending position order reaches the unique fixpoint
  * (l_i^t = l_{src}^{pos} for all t) in ≤ T steps.
  *
  * The state is mutated in place; `seed`/`epoch` determinize the re-picks
  * (a fresh `epoch` per batch keeps successive batches independent).
  */
object LocalIncremental {

  /** The deterministic Category-2/3 decision for `(i, t)` — delegates to
    * [[Picks.repick]], shared with the Spark engine.
    */
  def repickDecision(oldAdj: Array[Int], newAdj: Array[Int], i: Int, t: Int,
                     curSrc: Int, seed: Long, epoch: Long): Option[(Int, Int)] =
    Picks
      .repick(oldAdj.map(_.toLong), newAdj.map(_.toLong), i.toLong, t, curSrc.toLong, seed, epoch)
      .map { case (s, p) => (s.toInt, p) }

  /** Apply the edit batch: update `st` in place to the distributionally
    * correct state for `newG`.
    */
  def update(oldG: LocalGraph, newG: LocalGraph, st: RslpaState,
             seed: Long, epoch: Long): UpdateStats = {
    require(oldG.n == newG.n && st.n == newG.n, "vertex sets must match")
    val n = st.n; val T = st.T
    var repicked = 0L
    val touched = mutable.HashSet.empty[(Int, Int)]
    val changed = mutable.HashSet.empty[(Int, Int)]
    // Corrections ordered by ascending position: all upstream positions are
    // final when an entry pops, so each label settles exactly once.
    val queue = mutable.PriorityQueue.empty[(Int, Int)](Ordering.by { case (_, t) => -t })

    def setLabel(i: Int, t: Int, l: Long): Unit = {
      touched += ((i, t))
      if (st.labels(i)(t) != l) {
        st.labels(i)(t) = l
        changed += ((i, t))
        queue.enqueue((i, t))
      }
    }

    // Phase 1: adjacent edge changes.
    var i = 0
    while (i < n) {
      val oldAdj = oldG.adj(i); val newAdj = newG.adj(i)
      if (!newAdj.sameElements(oldAdj)) {
        var t = 1
        while (t <= T) {
          repickDecision(oldAdj, newAdj, i, t, st.srcs(i)(t), seed, epoch) match {
            case Some((src2, pos2)) =>
              val (src0, pos0) = (st.srcs(i)(t), st.poss(i)(t))
              st.recv(src0)(pos0) = st.recv(src0)(pos0).filterNot(_ == ((i, t)))
              st.srcs(i)(t) = src2; st.poss(i)(t) = pos2
              st.recv(src2)(pos2) ::= ((i, t))
              repicked += 1
              touched += ((i, t))
              setLabel(i, t, st.labels(src2)(pos2))
            case None => ()
          }
          t += 1
        }
      }
      i += 1
    }

    // Phase 2: correction propagation along R.
    var rounds = 0
    while (queue.nonEmpty) {
      val (j, p) = queue.dequeue()
      val l = st.labels(j)(p)
      st.recv(j)(p).foreach { case (tar, k) => setLabel(tar, k, l) }
      rounds = math.max(rounds, p)
    }
    UpdateStats(repicked, changed.size.toLong, touched.size.toLong, rounds)
  }
}
