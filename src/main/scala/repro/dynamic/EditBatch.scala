package repro.dynamic

import repro.graph.LocalGraph
import repro.util.{Rng, SplitMix64}

import scala.collection.mutable

/** A batch of uniformly random edge edits, as in §V-B1 of the paper:
  * for a batch of size `b`, `b/2` existing edges are picked uniformly for
  * deletion and `b/2` non-existing vertex pairs uniformly for insertion.
  * Deterministic in `seed`.
  */
final case class EditBatch(insertions: Vector[(Int, Int)], deletions: Vector[(Int, Int)]) {
  def size: Int = insertions.size + deletions.size
}

object EditBatch {

  /** Uniform batch over `g`: `nDelete` deletions of existing edges,
    * `nInsert` insertions of currently-absent pairs (no self-loops, no
    * duplicates, insertions disjoint from deletions).
    */
  def uniform(g: LocalGraph, nInsert: Int, nDelete: Int, seed: Long): EditBatch = {
    val rng: SplitMix64 = Rng.forItem(seed, 0L, Rng.SaltGen)
    val edges = g.edges
    require(nDelete <= edges.size, s"cannot delete $nDelete of ${edges.size} edges")

    // Deletions: partial Fisher–Yates over the edge index space.
    val idx = Array.tabulate(edges.size)(identity)
    var i = 0
    while (i < nDelete) {
      val j = i + rng.nextInt(idx.length - i)
      val t = idx(i); idx(i) = idx(j); idx(j) = t
      i += 1
    }
    val deletions = (0 until nDelete).map(k => edges(idx(k))).toVector

    // Insertions: rejection sampling over vertex pairs.
    val chosen = mutable.LinkedHashSet.empty[(Int, Int)]
    var guard = 0
    val maxTries = math.max(1000, nInsert * 200)
    while (chosen.size < nInsert && guard < maxTries) {
      val u = rng.nextInt(g.n); val v = rng.nextInt(g.n)
      if (u != v) {
        val e = (math.min(u, v), math.max(u, v))
        if (!g.hasEdge(e._1, e._2) && !chosen(e)) chosen += e
      }
      guard += 1
    }
    require(chosen.size == nInsert,
      s"could not sample $nInsert absent pairs after $maxTries tries (graph too dense?)")
    EditBatch(chosen.toVector, deletions)
  }

  /** Paper-style batch: half insertions, half deletions. */
  def halfAndHalf(g: LocalGraph, batchSize: Int, seed: Long): EditBatch =
    uniform(g, batchSize / 2, batchSize - batchSize / 2, seed)
}
