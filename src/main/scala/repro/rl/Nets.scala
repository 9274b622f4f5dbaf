package repro.rl

import repro.core.Rng

/** Running per-dimension standardizer (Welford).
  *
  * Stands in for the paper's batch normalization "before the activation to
  * avoid data scale issues": inputs are shifted/scaled to zero mean, unit
  * variance using running statistics, which is deterministic at inference
  * (see DESIGN.md §3).
  */
final class Standardizer(val dim: Int) extends Serializable {
  private val meanV = new Array[Double](dim)
  private val m2    = new Array[Double](dim)
  private var n     = 0L

  def count: Long = n
  def mean: Array[Double] = meanV.clone()

  def std: Array[Double] = {
    val out = new Array[Double](dim)
    var i = 0
    while (i < dim) { out(i) = if (n > 1) math.sqrt(m2(i) / (n - 1)) else 1.0; i += 1 }
    out
  }

  def update(x: Array[Double]): Unit = {
    require(x.length == dim, s"dim mismatch ${x.length} vs $dim")
    n += 1
    var i = 0
    while (i < dim) {
      val d = x(i) - meanV(i)
      meanV(i) += d / n
      m2(i) += d * (x(i) - meanV(i))
      i += 1
    }
  }

  def normalize(x: Array[Double]): Array[Double] = {
    val s = std
    val out = new Array[Double](dim)
    var i = 0
    while (i < dim) { out(i) = (x(i) - meanV(i)) / Standardizer.safeStd(s(i)); i += 1 }
    out
  }
}

object Standardizer {
  /** A (near-)zero standard deviation means "no scale information yet" —
    * treat it as unit scale. Dividing by a tiny epsilon instead turns the
    * normalizer into a million-fold amplifier on the first samples (two
    * identical observations ⇒ std = 0), which poisons downstream running
    * statistics irrecoverably.
    */
  def safeStd(s: Double): Double = if (s < 1e-9) 1.0 else s
}

/** Adam optimizer over a flat parameter array. */
final class Adam(dim: Int, lr: Double = 1e-3, b1: Double = 0.9, b2: Double = 0.999, eps: Double = 1e-8)
    extends Serializable {
  private val m = new Array[Double](dim)
  private val v = new Array[Double](dim)
  private var t = 0

  /** In-place parameter update given the loss gradient. */
  def step(params: Array[Double], grads: Array[Double]): Unit = {
    require(params.length == dim && grads.length == dim, "Adam dim mismatch")
    t += 1
    val c1 = 1 - math.pow(b1, t)
    val c2 = 1 - math.pow(b2, t)
    var i = 0
    while (i < dim) {
      m(i) = b1 * m(i) + (1 - b1) * grads(i)
      v(i) = b2 * v(i) + (1 - b2) * grads(i) * grads(i)
      params(i) -= lr * (m(i) / c1) / (math.sqrt(v(i) / c2) + eps)
      i += 1
    }
  }
}

/** The actor `μ(s; θ) = σ(W·s + b) + 1` — one input layer, one output
  * layer, rectified activation, plus one "to avoid assigning zero weights"
  * (Section V-A, Policy Learning).
  *
  * The activation is leaky ReLU (slope 0.01) rather than exact ReLU: with a
  * single scalar unit, exact ReLU makes the dead state (pre-activation
  * negative for every input) an absorbing fixed point of training — the
  * gradient is identically zero and the policy freezes at weight 1. The
  * leak keeps the unit trainable; at inference the output is still ≥ ~1
  * and is floored to stay positive (see DESIGN.md §3).
  */
final class ActorNet(val dim: Int, rng: Rng) extends Serializable {
  // params(0..dim-1) = W, params(dim) = b; positive initial bias keeps the
  // unit in its linear region for typical standardized states
  val params: Array[Double] = Array.tabulate(dim + 1) { i =>
    if (i < dim) rng.nextGaussian() * 0.1 else 1.0
  }

  def forward(sNorm: Array[Double]): Double = {
    var pre = params(dim)
    var i = 0
    while (i < dim) { pre += params(i) * sNorm(i); i += 1 }
    math.max(ActorNet.lrelu(pre) + 1.0, ActorNet.MinAction)
  }

  /** Gradient of the action w.r.t. params at `sNorm`, scaled by `upstream`
    * (dLoss/dAction). */
  def gradParams(sNorm: Array[Double], upstream: Double, out: Array[Double]): Unit = {
    var pre = params(dim)
    var i = 0
    while (i < dim) { pre += params(i) * sNorm(i); i += 1 }
    val g =
      if (ActorNet.lrelu(pre) + 1.0 <= ActorNet.MinAction) 0.0 // output floor active
      else if (pre > 0) upstream
      else upstream * ActorNet.LeakSlope
    i = 0
    while (i < dim) { out(i) += g * sNorm(i); i += 1 }
    out(dim) += g
  }

  def copyFrom(other: ActorNet): Unit = System.arraycopy(other.params, 0, params, 0, params.length)

  def softUpdate(other: ActorNet, tau: Double): Unit = {
    var i = 0
    while (i < params.length) { params(i) = (1 - tau) * params(i) + tau * other.params(i); i += 1 }
  }
}

object ActorNet {
  /** Leak slope of the rectifier. */
  val LeakSlope = 0.01
  /** Hard floor on emitted actions — edge weights must stay positive. */
  val MinAction = 0.01

  @inline def lrelu(pre: Double): Double = if (pre > 0) pre else LeakSlope * pre
}

/** The critic `Q(s, a; φ)`: input layer → hidden layer of 10 ReLU neurons →
  * linear output (Section V-A, Policy Learning).
  */
final class CriticNet(val stateDim: Int, rng: Rng, val hidden: Int = 10) extends Serializable {
  val inDim: Int = stateDim + 1 // state ++ action
  // layout: W1 (hidden × inDim) | b1 (hidden) | w2 (hidden) | b2 (1)
  val params: Array[Double] = {
    val p = new Array[Double](hidden * inDim + hidden + hidden + 1)
    val scale1 = math.sqrt(2.0 / inDim); val scale2 = math.sqrt(2.0 / hidden)
    var i = 0
    while (i < hidden * inDim) { p(i) = rng.nextGaussian() * scale1; i += 1 }
    var j = 0
    while (j < hidden) { p(hidden * inDim + hidden + j) = rng.nextGaussian() * scale2; j += 1 }
    p
  }
  private def w1(i: Int, j: Int): Double = params(i * inDim + j)
  private def b1(i: Int): Double = params(hidden * inDim + i)
  private def w2(i: Int): Double = params(hidden * inDim + hidden + i)
  private def b2: Double = params(hidden * inDim + 2 * hidden)

  def forward(z: Array[Double]): Double = {
    require(z.length == inDim, s"critic input dim ${z.length} vs $inDim")
    var q = b2
    var i = 0
    while (i < hidden) {
      var pre = b1(i)
      var j = 0
      while (j < inDim) { pre += w1(i, j) * z(j); j += 1 }
      if (pre > 0) q += w2(i) * pre
      i += 1
    }
    q
  }

  /** Backprop: accumulate dLoss/dparams into `gradOut` given upstream
    * `dLoss/dq`; returns dLoss/dz (for the actor's action gradient).
    */
  def backward(z: Array[Double], upstream: Double, gradOut: Array[Double]): Array[Double] = {
    val dz = new Array[Double](inDim)
    var i = 0
    while (i < hidden) {
      var pre = b1(i)
      var j = 0
      while (j < inDim) { pre += w1(i, j) * z(j); j += 1 }
      val h = math.max(pre, 0.0)
      gradOut(hidden * inDim + hidden + i) += upstream * h // dw2
      if (pre > 0) {
        val dpre = upstream * w2(i)
        gradOut(hidden * inDim + i) += dpre // db1
        j = 0
        while (j < inDim) {
          gradOut(i * inDim + j) += dpre * z(j) // dW1
          dz(j) += dpre * w1(i, j)
          j += 1
        }
      }
      i += 1
    }
    gradOut(hidden * inDim + 2 * hidden) += upstream // db2
    dz
  }

  def copyFrom(other: CriticNet): Unit = System.arraycopy(other.params, 0, params, 0, params.length)

  def softUpdate(other: CriticNet, tau: Double): Unit = {
    var i = 0
    while (i < params.length) { params(i) = (1 - tau) * params(i) + tau * other.params(i); i += 1 }
  }
}
