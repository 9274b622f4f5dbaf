package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.{Edge, EdgeEvent, Pattern, Rng, SubgraphCounter, Triangle, Wedge}
import repro.exact.ExactDynamicCounter

class RPSamplerSpec extends AnyFunSuite {

  test("sample stays within capacity and mirrors adjacency") {
    val rng = new Rng(1)
    val rp = new RPSampler(20, rng)
    val events = TestUtil.randomEvents(nVertices = 25, steps = 2000, seed = 1, deleteBias = 0.3)
    var n = 0L
    events.foreach { ev =>
      if (ev.insert) { n += 1; rp.insert(ev.u, ev.v, n)(_ => ()) }
      else { rp.delete(ev.u, ev.v); n -= 1 }
      assert(rp.size <= 20)
      assert(rp.adj.edgeCount == rp.size)
    }
  }

  test("insertion-only fills up to capacity, then swaps") {
    val rng = new Rng(2)
    val rp = new RPSampler(10, rng)
    (1 to 10).foreach(i => rp.insert(0, i, i)(_ => ()))
    assert(rp.size == 10)
    (11 to 100).foreach(i => rp.insert(0, i, i)(_ => ()))
    assert(rp.size == 10)
  }

  test("uniformity: every edge equally likely to be sampled (insertion-only)") {
    val nEdges = 40
    val cap = 10
    val trials = 6000
    val hits = new Array[Int](nEdges)
    (1 to trials).foreach { t =>
      val rp = new RPSampler(cap, new Rng(t))
      (0 until nEdges).foreach(i => rp.insert(0, i + 1, i + 1)(_ => ()))
      (0 until nEdges).foreach(i => if (rp.contains(Edge.key(0, i + 1))) hits(i) += 1)
    }
    val expected = cap.toDouble / nEdges
    hits.foreach { h =>
      assert(math.abs(h.toDouble / trials - expected) < 0.035,
        s"freq ${h.toDouble / trials} vs $expected")
    }
  }

  test("uniformity holds under deletions (random pairing)") {
    // insert 30, delete 10 specific ones, insert 10 more; all 30 live edges
    // must have (approximately) equal inclusion probability
    val trials = 6000
    val hits = scala.collection.mutable.HashMap.empty[Long, Int].withDefaultValue(0)
    val live = (0 until 20).map(i => Edge.key(100, i + 1)) ++ (0 until 10).map(i => Edge.key(200, i + 1))
    (1 to trials).foreach { t =>
      val rp = new RPSampler(8, new Rng(t))
      var n = 0L
      (0 until 30).foreach { i => n += 1; rp.insert(100, i + 1, n)(_ => ()) }
      (20 until 30).foreach { i => rp.delete(100, i + 1); n -= 1 }
      (0 until 10).foreach { i => n += 1; rp.insert(200, i + 1, n)(_ => ()) }
      live.foreach(k => if (rp.contains(k)) hits(k) += 1)
    }
    val freqs = live.map(k => hits(k).toDouble / trials)
    val grand = freqs.sum / freqs.size
    freqs.foreach(f => assert(math.abs(f - grand) < 0.04, s"freq $f vs mean $grand"))
  }

  test("jointProb caps factors at 1 and handles degenerate inputs") {
    assert(RPSampler.jointProb(0, 10, 100, 0) == 1.0)
    assert(RPSampler.jointProb(2, 10, 5, 0) == 1.0) // capacity exceeds population
    val p = RPSampler.jointProb(2, 10, 100, 0)
    assert(math.abs(p - (10.0 / 100) * (9.0 / 99)) < 1e-12)
    assert(RPSampler.jointProb(1, 10, 0, 0) == 1.0) // empty population guard
  }
}

class BaselineCountersSpec extends AnyFunSuite {

  private def algorithms(pattern: Pattern, m: Int, seed: Long): Seq[SubgraphCounter] =
    Seq(new Triest(pattern, m, seed), new ThinkD(pattern, m, seed), new WRS(pattern, m, seed))

  test("names match the paper's columns") {
    assert(algorithms(Triangle, 10, 1).map(_.name) == Seq("Triest", "ThinkD", "WRS"))
  }

  for (pattern <- Pattern.all)
    test(s"sample size bounded by M under heavy dynamics (${pattern.name})") {
      val events = TestUtil.randomEvents(nVertices = 20, steps = 1200, seed = 7, deleteBias = 0.35)
      algorithms(pattern, m = 25, seed = 3).foreach { alg =>
        events.foreach { ev => alg.process(ev); assert(alg.sampleSize <= 25, alg.name) }
      }
    }

  test("exact when the budget holds everything (insertion-only)") {
    val events = TestUtil.randomEvents(nVertices = 30, steps = 300, seed = 8, deleteBias = 0.0)
    val exact = new ExactDynamicCounter(Triangle)
    events.foreach(exact.process)
    algorithms(Triangle, m = 10000, seed = 5).foreach { alg =>
      events.foreach(alg.process)
      assert(math.abs(alg.estimate - exact.count) < 1e-6, s"${alg.name}: ${alg.estimate} vs ${exact.count}")
    }
  }

  private def mcMean(mk: Long => SubgraphCounter, events: Array[EdgeEvent], trials: Int): (Double, Double) = {
    val estimates = (1 to trials).map { t =>
      val alg = mk(6000L + t)
      events.foreach(alg.process)
      alg.estimate
    }
    TestUtil.meanSem(estimates.map(x => x: Double))
  }

  // The RP-based estimators use the standard joint-inclusion approximation;
  // we allow a small bias band on top of the Monte-Carlo noise.
  for ((label, mk) <- Seq[(String, (Pattern, Int, Long) => SubgraphCounter)](
         ("Triest", (p, m, s) => new Triest(p, m, s)),
         ("ThinkD", (p, m, s) => new ThinkD(p, m, s)),
         ("WRS", (p, m, s) => new WRS(p, m, s))))
    test(s"$label approximately unbiased on a dynamic stream (triangles)") {
      val events = TestUtil.randomEvents(nVertices = 20, steps = 400, seed = 9, deleteBias = 0.25)
      val exact = new ExactDynamicCounter(Triangle)
      events.foreach(exact.process)
      val truth = exact.count.toDouble
      assert(truth > 0)
      val (mean, sem) = mcMean(s => mk(Triangle, 60, s), events, trials = 3000)
      assert(math.abs(mean - truth) <= 5 * sem + 0.05 * truth,
        s"$label: mean=$mean truth=$truth sem=$sem")
    }

  test("ThinkD approximately unbiased for wedges") {
    val events = TestUtil.randomEvents(nVertices = 25, steps = 400, seed = 10, deleteBias = 0.25)
    val exact = new ExactDynamicCounter(Wedge)
    events.foreach(exact.process)
    val truth = exact.count.toDouble
    val (mean, sem) = mcMean(s => new ThinkD(Wedge, 60, s), events, trials = 2000)
    assert(math.abs(mean - truth) <= 5 * sem + 0.05 * truth, s"mean=$mean truth=$truth sem=$sem")
  }

  test("WRS waiting room holds the most recent edges") {
    val wrs = new WRS(Triangle, M = 40, seed = 11, lambda = 0.25)
    val events = TestUtil.randomEvents(nVertices = 40, steps = 600, seed = 11, deleteBias = 0.0)
    events.foreach(wrs.process)
    assert(wrs.waitingRoomSize == 10) // λ·M
    assert(wrs.reservoirSize <= 30)
  }

  test("WRS rejects degenerate lambda") {
    intercept[IllegalArgumentException](new WRS(Triangle, 10, 1, lambda = 0.0))
    intercept[IllegalArgumentException](new WRS(Triangle, 10, 1, lambda = 1.0))
  }

  test("deterministic given the seed") {
    val events = TestUtil.randomEvents(nVertices = 20, steps = 800, seed = 12, deleteBias = 0.3)
    def est(mk: Long => SubgraphCounter, seed: Long): Double = {
      val a = mk(seed); events.foreach(a.process); a.estimate
    }
    Seq[(Long => SubgraphCounter)](
      s => new Triest(Triangle, 30, s),
      s => new ThinkD(Triangle, 30, s),
      s => new WRS(Triangle, 30, s),
    ).foreach { mk => assert(est(mk, 5) == est(mk, 5)) }
  }
}
