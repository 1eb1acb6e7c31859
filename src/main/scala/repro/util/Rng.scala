package repro.util

/** Deterministic, platform-independent pseudo-random streams.
  *
  * Every random decision in SLPA/rSLPA is drawn from a stream keyed by
  * `(seed, vertex, iteration, salt)`. Both the local (array-based) and the
  * Spark (RDD message-passing) engines derive the *same* stream for the
  * same key, which makes their outputs bit-identical and testable against
  * each other. The generator is SplitMix64 (Steele et al., 2014) — small,
  * fast, and with well-distributed low bits.
  */
final class SplitMix64(seed0: Long) {
  private var state: Long = seed0

  /** Next raw 64-bit value. */
  def nextLong(): Long = {
    state += 0x9e3779b97f4a7c15L
    var z = state
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Uniform int in [0, bound). Requires bound > 0. */
  def nextInt(bound: Int): Int = {
    require(bound > 0, s"bound must be positive, got $bound")
    // Rejection-free for our purposes: modulo bias is negligible for
    // bound << 2^63 and irrelevant to the algorithmic guarantees tested.
    val v = nextLong() >>> 1
    (v % bound).toInt
  }

  /** Uniform double in [0, 1). */
  def nextDouble(): Double = (nextLong() >>> 11) * 1.1102230246251565e-16
}

object Rng {
  /** Salts separating independent decision streams. */
  val SaltPropagate: Long = 0x51a7_0001L // rSLPA (src, pos) pick
  val SaltSend: Long      = 0x51a7_0002L // SLPA per-neighbor label send
  val SaltTie: Long       = 0x51a7_0003L // SLPA plurality tie-break
  val SaltRepick: Long    = 0x51a7_0004L // incremental re-pick decisions
  val SaltGen: Long       = 0x51a7_0005L // graph generators

  private def mix(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Stream for a `(seed, vertex, iteration, salt)` decision point. */
  def forVertex(seed: Long, vid: Long, t: Int, salt: Long): SplitMix64 =
    new SplitMix64(mix(mix(mix(seed ^ salt) ^ vid) ^ t.toLong))

  /** Stream for generator work item `i` under `seed`. */
  def forItem(seed: Long, i: Long, salt: Long): SplitMix64 =
    new SplitMix64(mix(mix(seed ^ salt) ^ i))
}
