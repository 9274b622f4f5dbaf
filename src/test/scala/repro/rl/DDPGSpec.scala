package repro.rl

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Rng, TemporalAgg, Triangle}
import repro.TestUtil
import repro.graphgen.{Datasets, Scenario}

class DDPGSpec extends AnyFunSuite {

  test("trainStep is a no-op before a full batch is available") {
    val d = new DDPG(stateDim = 2, seed = 1, batch = 64)
    val before = d.actor.params.clone()
    d.observe(Transition(Array(1.0, 2.0), 1.5, 0.1, Array(2.0, 1.0)))
    d.trainStep()
    assert(d.actor.params.toSeq == before.toSeq)
    assert(d.trainedSteps == 0)
  }

  test("action floor: deterministic ≥ 1, exploring > 0") {
    val d = new DDPG(stateDim = 2, seed = 2)
    val rng = new Rng(3)
    (1 to 200).foreach { _ =>
      val s = Array(rng.nextGaussian() * 10, rng.nextGaussian() * 10)
      assert(d.act(s) >= ActorNet.MinAction)
      assert(d.actExplore(s, sigma = 5.0) > 0.0)
    }
  }

  test("learns a bandit: reward maximised at high action") {
    // single-step MDP, reward = -(a - 4)^2; the policy should move toward 4
    val d = new DDPG(stateDim = 1, seed = 4, batch = 32)
    val rng = new Rng(5)
    (1 to 4000).foreach { _ =>
      val s = Array(rng.nextGaussian())
      val a = d.actExplore(s, sigma = 1.5)
      val r = -(a - 4.0) * (a - 4.0)
      d.observe(Transition(s, a, r, Array(rng.nextGaussian()), done = true))
      d.trainStep()
    }
    val acts = (1 to 200).map(_ => d.act(Array(new Rng(6).nextGaussian())))
    val mean = acts.sum / acts.size
    assert(math.abs(mean - 4.0) < 1.5, s"policy mean action $mean, expected ≈ 4")
  }

  test("learns a state-dependent preference") {
    // reward = -(a - (1 + 5·1{s>0}))²: optimal action 6 for s>0, 1 for s<0
    val d = new DDPG(stateDim = 1, seed = 7, batch = 32)
    val rng = new Rng(8)
    (1 to 12000).foreach { _ =>
      val s = Array(if (rng.nextDouble() < 0.5) 1.0 else -1.0)
      val a = d.actExplore(s, sigma = 3.0)
      val target = if (s(0) > 0) 6.0 else 1.0
      // rewards scaled to the magnitude regime of the real MDP (relative
      // errors, O(1)) — the fixed 1e-3 learning rate is tuned for that
      d.observe(Transition(s, a, -(a - target) * (a - target) / 100.0,
        Array(if (rng.nextDouble() < 0.5) 1.0 else -1.0), done = true))
      d.trainStep()
    }
    val hi = d.act(Array(1.0)); val lo = d.act(Array(-1.0))
    assert(hi > lo, s"expected act(+1)=$hi > act(-1)=$lo")
  }
}

class TrainingSpec extends AnyFunSuite {

  private def tinyStreams(n: Int): Seq[Array[repro.core.EdgeEvent]] = {
    val edges = Datasets.train("synthetic", 600)
    (0 until n).map(i => Scenario.Light(0.2).build(edges, seed = 11 + i))
  }

  test("trainPolicy produces a frozen policy with positive weights everywhere") {
    val trained = Training.trainPolicy(tinyStreams(2), Triangle, m = 60, seed = 1, gradSteps = 150)
    assert(trained.gradSteps > 0, "no gradient steps executed")
    assert(trained.seconds > 0)
    val p = trained.policy
    assert(p.w.length == 3 + Triangle.size)
    val rng = new Rng(2)
    (1 to 500).foreach { _ =>
      val s = Array.fill(p.w.length)(math.abs(rng.nextGaussian()) * 50)
      assert(p.weight(s) >= ActorNet.MinAction)
    }
  }

  test("trained policy is deterministic at inference") {
    val trained = Training.trainPolicy(tinyStreams(1), Triangle, m = 60, seed = 3, gradSteps = 60)
    val s = Array(5.0, 3.0, 2.0, 10.0, 11.0, 12.0)
    assert(trained.policy.weight(s) == trained.policy.weight(s))
  }

  test("temporal aggregation variants both train") {
    Seq(TemporalAgg.Max, TemporalAgg.Avg).foreach { agg =>
      val t = Training.trainPolicy(tinyStreams(1), Triangle, m = 60, seed = 4,
        temporalAgg = agg, gradSteps = 40)
      assert(t.policy.w.nonEmpty)
    }
  }

  test("training requires at least one stream") {
    intercept[IllegalArgumentException](Training.trainPolicy(Nil, Triangle, 10, 1))
  }

  test("exploring weight records its last action") {
    val d = new DDPG(stateDim = 9, seed = 9)
    val ew = new ExploringWeight(d, sigma = 0.5)
    val a = ew.weight(Array.fill(9)(1.0))
    assert(a == ew.lastAction && a > 0)
  }

  test("TrainedPolicy.from snapshots actor parameters") {
    val d = new DDPG(stateDim = 3, seed = 10)
    val p = TrainedPolicy.from(d)
    val s = Array(1.0, 2.0, 3.0)
    assert(math.abs(p.weight(s) - d.act(s)) < 1e-9)
  }
}
