package repro.rl

import repro.core.Rng

/** One MDP transition `(s_k, a_k, r_k, s_{k+1})` (Section IV-A); `done`
  * marks the end of an episode (no bootstrapping past it). */
final case class Transition(s: Array[Double], a: Double, r: Double, s2: Array[Double],
                            done: Boolean = false)

/** Fixed-capacity ring-buffer replay memory with uniform sampling. */
final class ReplayBuffer(val capacity: Int) extends Serializable {
  private val buf = new Array[Transition](capacity)
  private var n = 0
  private var next = 0

  def size: Int = n

  def add(t: Transition): Unit = {
    buf(next) = t
    next = (next + 1) % capacity
    if (n < capacity) n += 1
  }

  /** Uniform sample of `k` transitions (with replacement). */
  def sample(k: Int, rng: Rng): Array[Transition] = {
    require(n > 0, "sampling from empty replay buffer")
    Array.fill(k)(buf(rng.nextInt(n)))
  }
}
