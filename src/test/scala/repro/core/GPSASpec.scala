package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.exact.ExactDynamicCounter

class GPSASpec extends AnyFunSuite {

  test("reservoir bounded by M; tagged edges stay resident (the GPS-A flaw)") {
    val events = TestUtil.randomEvents(nVertices = 25, steps = 1500, seed = 1, deleteBias = 0.3)
    val g = new GPSA(Triangle, M = 30, HeuristicWeight, seed = 1)
    events.foreach { ev => g.process(ev); assert(g.sampleSize <= 30) }
    // with this many deletions, some sampled edges must have been tagged
    assert(g.taggedCount > 0, "expected DEL-tagged slots to accumulate")
  }

  test("estimate exact when nothing is evicted (insertion-only, huge M)") {
    Pattern.all.foreach { pattern =>
      val events = TestUtil.randomEvents(nVertices = 30, steps = 300, seed = 2, deleteBias = 0.0)
      val g = new GPSA(pattern, M = 10000, HeuristicWeight, seed = 2)
      val exact = new ExactDynamicCounter(pattern)
      events.foreach { ev => g.process(ev); exact.process(ev) }
      assert(math.abs(g.estimate - exact.count) < 1e-6, pattern.name)
    }
  }

  test("estimate exact when nothing is evicted (with deletions, huge M)") {
    val events = TestUtil.randomEvents(nVertices = 14, steps = 400, seed = 3, deleteBias = 0.3)
    val g = new GPSA(Triangle, M = 10000, HeuristicWeight, seed = 3)
    val exact = new ExactDynamicCounter(Triangle)
    events.foreach { ev => g.process(ev); exact.process(ev) }
    assert(math.abs(g.estimate - exact.count) < 1e-6)
  }

  test("r_{M+1} proxy z is monotonically non-decreasing") {
    val events = TestUtil.randomEvents(nVertices = 25, steps = 1500, seed = 4, deleteBias = 0.2)
    val g = new GPSA(Triangle, M = 25, HeuristicWeight, seed = 4)
    var last = 0.0
    events.foreach { ev =>
      g.process(ev)
      assert(g.rM1 >= last)
      last = g.rM1
    }
    assert(last > 0.0, "z should have moved once the reservoir overflowed")
  }

  private def mc(pattern: Pattern, events: Array[EdgeEvent], m: Int, trials: Int): (Double, Double) = {
    val estimates = (1 to trials).map { t =>
      val g = new GPSA(pattern, m, HeuristicWeight, seed = 3000L + t)
      events.foreach(g.process)
      g.estimate
    }
    TestUtil.meanSem(estimates.map(x => x: Double))
  }

  test("GPS unbiasedness on insertion-only stream (Theorem 1)") {
    val events = TestUtil.randomEvents(nVertices = 25, steps = 250, seed = 5, deleteBias = 0.0)
    val exact = new ExactDynamicCounter(Triangle)
    events.foreach(exact.process)
    val truth = exact.count.toDouble
    assert(truth > 0)
    val (mean, sem) = mc(Triangle, events, m = 60, trials = 3000)
    assert(math.abs(mean - truth) <= 5 * sem + 1e-9, s"mean=$mean truth=$truth sem=$sem")
  }

  test("GPS-A unbiasedness on fully dynamic stream (Theorem 2)") {
    val events = TestUtil.randomEvents(nVertices = 20, steps = 400, seed = 6, deleteBias = 0.3)
    val exact = new ExactDynamicCounter(Triangle)
    events.foreach(exact.process)
    val truth = exact.count.toDouble
    assert(truth > 0)
    val (mean, sem) = mc(Triangle, events, m = 60, trials = 3000)
    assert(math.abs(mean - truth) <= 5 * sem + 1e-9, s"mean=$mean truth=$truth sem=$sem")
  }

  test("gps factory names the counter GPS") {
    assert(GPSA.gps(Triangle, 10, HeuristicWeight, 1).name == "GPS")
    assert(new GPSA(Triangle, 10, HeuristicWeight, 1).name == "GPS-A")
  }
}
