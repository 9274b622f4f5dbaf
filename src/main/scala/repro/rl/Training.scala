package repro.rl

import repro.core.{EdgeEvent, Pattern, TemporalAgg, WSD}
import repro.exact.ExactDynamicCounter

/** DDPG training loop for the WSD-L weight function (Section IV-B).
  *
  * Each episode replays one training stream through a WSD sampler whose
  * weight function queries the learner with exploration noise; an exact
  * counter running alongside supplies the ground truth for the reward
  * `r_k = ε(t_k) − ε(t_{k+1})` (Eq. 25; ε taken relative, see DESIGN.md §3).
  * Gradient updates are spread evenly so the total comes to `gradSteps`
  * (the paper's 1,000 iterations).
  */
object Training {

  /** Result of a training run: the frozen policy plus the wall time. */
  final case class Trained(policy: TrainedPolicy, seconds: Double, gradSteps: Long)

  def trainPolicy(
      streams: Seq[Array[EdgeEvent]],
      pattern: Pattern,
      m: Int,
      seed: Long,
      temporalAgg: TemporalAgg = TemporalAgg.Max,
      gradSteps: Int = 1000,
      initialSigma: Double = 2.0,
  ): Trained = {
    require(streams.nonEmpty, "need at least one training stream")
    val t0 = System.nanoTime()
    val ddpg = new DDPG(stateDim = 3 + pattern.size, seed = seed)
    val explore = new ExploringWeight(ddpg, initialSigma)

    val totalInsertions = streams.iterator.map(_.count(_.insert)).sum
    val trainEvery = math.max(1, totalInsertions / math.max(1, gradSteps))

    var insertionIdx = 0L
    streams.zipWithIndex.foreach { case (stream, epi) =>
      // decay exploration noise across episodes
      explore.sigma = initialSigma / (1.0 + epi)
      val sampler = new WSD(pattern, m, explore, seed = seed + 7919 * (epi + 1), temporalAgg)
      val exact   = new ExactDynamicCounter(pattern)
      var prev: Transition = null
      var prevEps = 0.0
      stream.foreach { ev =>
        sampler.process(ev)
        exact.process(ev)
        if (ev.insert) {
          val s = sampler.lastState
          val a = explore.lastAction
          val truth = exact.count
          val eps = math.abs(sampler.estimate - truth) / math.max(1.0, truth.toDouble)
          if (prev != null) ddpg.observe(Transition(prev.s, prev.a, prevEps - eps, s))
          prev = Transition(s, a, 0.0, s)
          prevEps = eps
          insertionIdx += 1
          if (insertionIdx % trainEvery == 0) ddpg.trainStep()
        }
      }
      // terminal transition: reward against the end-of-stream error
      if (prev != null) {
        val truth = exact.count
        val epsEnd = math.abs(sampler.estimate - truth) / math.max(1.0, truth.toDouble)
        ddpg.observe(Transition(prev.s, prev.a, prevEps - epsEnd, prev.s, done = true))
      }
    }
    val seconds = (System.nanoTime() - t0) / 1e9
    Trained(TrainedPolicy.from(ddpg), seconds, ddpg.trainedSteps)
  }
}
