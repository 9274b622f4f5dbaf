package repro.core

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("deterministic for a fixed seed") {
    val a = new Rng(42); val b = new Rng(42)
    assert((1 to 100).map(_ => a.nextLong()) == (1 to 100).map(_ => b.nextLong()))
  }

  test("different seeds diverge") {
    val a = new Rng(1); val b = new Rng(2)
    assert((1 to 10).map(_ => a.nextLong()) != (1 to 10).map(_ => b.nextLong()))
  }

  test("nextDouble in [0,1)") {
    val r = new Rng(7)
    (1 to 10000).foreach { _ => val d = r.nextDouble(); assert(d >= 0.0 && d < 1.0) }
  }

  test("nextOpenClosed in (0,1]") {
    val r = new Rng(8)
    (1 to 10000).foreach { _ => val d = r.nextOpenClosed(); assert(d > 0.0 && d <= 1.0) }
  }

  test("nextInt respects bound and covers range") {
    val r = new Rng(9)
    val seen = Array.fill(10)(0)
    (1 to 10000).foreach { _ => val i = r.nextInt(10); assert(i >= 0 && i < 10); seen(i) += 1 }
    assert(seen.forall(_ > 500), s"skewed counts: ${seen.mkString(",")}")
  }

  test("nextDouble has mean ~0.5") {
    val r = new Rng(10)
    val mean = (1 to 100000).map(_ => r.nextDouble()).sum / 100000
    assert(math.abs(mean - 0.5) < 0.01)
  }

  test("nextGaussian has mean ~0 and var ~1") {
    val r = new Rng(11)
    val xs = (1 to 100000).map(_ => r.nextGaussian())
    val mean = xs.sum / xs.size
    val varr = xs.map(x => (x - mean) * (x - mean)).sum / xs.size
    assert(math.abs(mean) < 0.02, s"mean=$mean")
    assert(math.abs(varr - 1.0) < 0.05, s"var=$varr")
  }

  test("state snapshot/restore resumes the sequence") {
    val r = new Rng(12)
    (1 to 5).foreach(_ => r.nextLong())
    val snap = r.stateSnapshot
    val tail = (1 to 5).map(_ => r.nextLong())
    val r2 = new Rng(0); r2.restore(snap)
    assert((1 to 5).map(_ => r2.nextLong()) == tail)
  }
}
