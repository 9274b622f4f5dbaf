package repro.rl

import repro.core.WeightFunction

/** A frozen, learned weight function — the artifact of DDPG training.
  *
  * Mirrors the paper's deployment step ("we hardcode the parameters
  * θ = {W, b}" after PyTorch training): a linear layer over the
  * standardized state, ReLU, plus one. Immutable and serializable, so it
  * ships cleanly into Spark closures for the parallel evaluation trials.
  */
final case class TrainedPolicy(
    w: Array[Double],
    b: Double,
    featMean: Array[Double],
    featStd: Array[Double],
    override val name: String = "WSD-L",
) extends WeightFunction {
  override def needsTemporal: Boolean = true

  override def weight(state: Array[Double]): Double = {
    var pre = b
    var i = 0
    while (i < w.length) {
      pre += w(i) * (state(i) - featMean(i)) / Standardizer.safeStd(featStd(i))
      i += 1
    }
    // same activation as the ActorNet it was snapshotted from
    math.max(ActorNet.lrelu(pre) + 1.0, ActorNet.MinAction)
  }
}

object TrainedPolicy {
  /** Snapshot the current actor + standardizer of a DDPG learner. */
  def from(ddpg: DDPG, name: String = "WSD-L"): TrainedPolicy = {
    val p = ddpg.actor.params
    TrainedPolicy(
      w = java.util.Arrays.copyOf(p, ddpg.stateDim),
      b = p(ddpg.stateDim),
      featMean = ddpg.stateStd.mean,
      featStd = ddpg.stateStd.std,
      name = name,
    )
  }
}

/** Weight function used *during* training: queries the learner with
  * exploration noise and records the (raw state, action) pair so the
  * training loop can assemble transitions.
  */
final class ExploringWeight(ddpg: DDPG, var sigma: Double) extends WeightFunction {
  var lastAction: Double = 1.0
  override val name = "WSD-L(explore)"
  override def needsTemporal: Boolean = true

  override def weight(state: Array[Double]): Double = {
    val a = ddpg.actExplore(state, sigma)
    lastAction = a
    a
  }
}
