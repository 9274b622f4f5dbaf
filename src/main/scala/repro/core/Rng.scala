package repro.core

/** Deterministic, serializable splitmix64 RNG.
  *
  * `java.util.SplittableRandom` is not `Serializable`, which breaks Spark
  * closures and the Structured Streaming state encoder, so the samplers use
  * this minimal generator instead. Same-stream reproducibility only depends
  * on the seed.
  */
final class Rng(seed: Long) extends Serializable {
  private var state: Long = seed

  /** Next raw 64-bit value (splitmix64). */
  def nextLong(): Long = {
    state += 0x9e3779b97f4a7c15L
    var z = state
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Uniform double in [0, 1). */
  def nextDouble(): Double = (nextLong() >>> 11) * 1.1102230246251565e-16

  /** Uniform double in (0, 1] — the rank function's `u` must be non-zero. */
  def nextOpenClosed(): Double = 1.0 - nextDouble()

  /** Uniform int in [0, n). */
  def nextInt(n: Int): Int = {
    require(n > 0, s"nextInt bound must be positive, got $n")
    var bits = 0L; var out = 0L
    do { bits = nextLong() >>> 1; out = bits % n } while (bits - out + (n - 1) < 0)
    out.toInt
  }

  /** Standard normal via Box–Muller (one value per call). */
  def nextGaussian(): Double = {
    val u1 = math.max(nextDouble(), 1e-300)
    val u2 = nextDouble()
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  /** Snapshot of the internal state (for streaming-state round trips). */
  def stateSnapshot: Long = state

  /** Restore a previously snapshotted state. */
  def restore(s: Long): Unit = { state = s }
}
