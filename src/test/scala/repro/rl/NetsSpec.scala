package repro.rl

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Rng

class StandardizerSpec extends AnyFunSuite {

  test("matches batch mean and std") {
    val rng = new Rng(1)
    val xs = Array.fill(5000)(Array(rng.nextGaussian() * 3 + 5, rng.nextDouble() * 10))
    val st = new Standardizer(2)
    xs.foreach(st.update)
    val mean0 = xs.map(_(0)).sum / xs.length
    assert(math.abs(st.mean(0) - mean0) < 1e-9)
    assert(math.abs(st.mean(1) - xs.map(_(1)).sum / xs.length) < 1e-9)
    assert(math.abs(st.std(0) - 3.0) < 0.15)
  }

  test("normalize produces ~zero mean, ~unit variance") {
    val rng = new Rng(2)
    val xs = Array.fill(5000)(Array(rng.nextGaussian() * 7 - 3))
    val st = new Standardizer(1)
    xs.foreach(st.update)
    val normed = xs.map(st.normalize(_)(0))
    val m = normed.sum / normed.length
    val v = normed.map(x => (x - m) * (x - m)).sum / normed.length
    assert(math.abs(m) < 0.05 && math.abs(v - 1.0) < 0.05)
  }

  test("empty standardizer normalizes with unit std") {
    val st = new Standardizer(2)
    assert(st.normalize(Array(1.0, 2.0)).toSeq == Seq(1.0, 2.0))
  }

  test("dimension mismatch rejected") {
    intercept[IllegalArgumentException](new Standardizer(2).update(Array(1.0)))
  }
}

class AdamSpec extends AnyFunSuite {

  test("minimizes a quadratic") {
    // f(x) = (x - 3)^2, gradient 2(x - 3)
    val params = Array(10.0)
    val adam = new Adam(1, lr = 0.1)
    (1 to 500).foreach(_ => adam.step(params, Array(2 * (params(0) - 3))))
    assert(math.abs(params(0) - 3.0) < 0.05, s"x=${params(0)}")
  }

  test("minimizes a 2-d quadratic with different curvatures") {
    val params = Array(5.0, -5.0)
    val adam = new Adam(2, lr = 0.05)
    (1 to 2000).foreach { _ =>
      adam.step(params, Array(2 * (params(0) - 1), 20 * (params(1) - 2)))
    }
    assert(math.abs(params(0) - 1.0) < 0.05 && math.abs(params(1) - 2.0) < 0.05)
  }
}

class NetGradientSpec extends AnyFunSuite {

  private val eps = 1e-5

  test("actor forward: leaky rectifier + 1, floored positive") {
    val a = new ActorNet(2, new Rng(1))
    a.params(0) = 1.0; a.params(1) = 2.0; a.params(2) = 0.5 // W=(1,2), b=0.5
    assert(math.abs(a.forward(Array(1.0, 1.0)) - 4.5) < 1e-12)
    // pre = -9.5 ⇒ 1 + 0.01·(-9.5)
    assert(math.abs(a.forward(Array(-10.0, 0.0)) - (1.0 - 0.095)) < 1e-12)
    // deeply negative pre hits the positivity floor
    assert(a.forward(Array(-10000.0, 0.0)) == ActorNet.MinAction)
  }

  test("actor gradient matches finite differences") {
    val rng = new Rng(3)
    val a = new ActorNet(4, rng)
    val s = Array.fill(4)(rng.nextGaussian())
    val grad = new Array[Double](a.params.length)
    a.gradParams(s, upstream = 1.0, grad)
    a.params.indices.foreach { i =>
      val orig = a.params(i)
      a.params(i) = orig + eps; val fp = a.forward(s)
      a.params(i) = orig - eps; val fm = a.forward(s)
      a.params(i) = orig
      val fd = (fp - fm) / (2 * eps)
      assert(math.abs(fd - grad(i)) < 1e-6, s"param $i: fd=$fd analytic=${grad(i)}")
    }
  }

  test("critic forward: hidden ReLU layer") {
    val c = new CriticNet(1, new Rng(4), hidden = 2)
    // zero everything, then set one hidden unit by hand
    java.util.Arrays.fill(c.params, 0.0)
    c.params(0) = 1.0; c.params(1) = 1.0 // W1 row 0 = (1,1)
    c.params(c.hidden * c.inDim + c.hidden) = 2.0 // w2(0) = 2
    assert(math.abs(c.forward(Array(1.0, 2.0)) - 6.0) < 1e-12) // 2·relu(3)
    assert(c.forward(Array(-1.0, -2.0)) == 0.0)
  }

  test("critic parameter gradient matches finite differences") {
    val rng = new Rng(5)
    val c = new CriticNet(3, rng)
    val z = Array.fill(4)(rng.nextGaussian())
    val grad = new Array[Double](c.params.length)
    c.backward(z, upstream = 1.0, grad)
    // spot check a spread of parameters (full sweep is slow but fine at 51)
    c.params.indices.foreach { i =>
      val orig = c.params(i)
      c.params(i) = orig + eps; val fp = c.forward(z)
      c.params(i) = orig - eps; val fm = c.forward(z)
      c.params(i) = orig
      val fd = (fp - fm) / (2 * eps)
      assert(math.abs(fd - grad(i)) < 1e-5, s"param $i: fd=$fd analytic=${grad(i)}")
    }
  }

  test("critic input gradient matches finite differences") {
    val rng = new Rng(6)
    val c = new CriticNet(3, rng)
    val z = Array.fill(4)(rng.nextGaussian())
    val dz = c.backward(z, upstream = 1.0, new Array[Double](c.params.length))
    z.indices.foreach { j =>
      val orig = z(j)
      z(j) = orig + eps; val fp = c.forward(z)
      z(j) = orig - eps; val fm = c.forward(z)
      z(j) = orig
      val fd = (fp - fm) / (2 * eps)
      assert(math.abs(fd - dz(j)) < 1e-5, s"z($j): fd=$fd analytic=${dz(j)}")
    }
  }

  test("soft update interpolates parameters") {
    val rng = new Rng(7)
    val a = new ActorNet(2, rng); val b = new ActorNet(2, rng)
    val before = a.params.clone()
    a.softUpdate(b, 0.5)
    a.params.indices.foreach { i =>
      assert(math.abs(a.params(i) - (0.5 * before(i) + 0.5 * b.params(i))) < 1e-12)
    }
  }

  test("copyFrom clones parameters") {
    val rng = new Rng(8)
    val a = new CriticNet(2, rng); val b = new CriticNet(2, rng)
    a.copyFrom(b)
    assert(a.params.toSeq == b.params.toSeq)
  }
}

class ReplayBufferSpec extends AnyFunSuite {

  private def tr(x: Double) = Transition(Array(x), x, x, Array(x))

  test("capacity is enforced (ring overwrite)") {
    val rb = new ReplayBuffer(10)
    (1 to 25).foreach(i => rb.add(tr(i)))
    assert(rb.size == 10)
    val sampled = rb.sample(100, new Rng(1)).map(_.a).toSet
    assert(sampled.subsetOf((16 to 25).map(_.toDouble).toSet))
  }

  test("sampling from empty buffer rejected") {
    intercept[IllegalArgumentException](new ReplayBuffer(5).sample(1, new Rng(1)))
  }

  test("uniform-ish sampling") {
    val rb = new ReplayBuffer(5)
    (1 to 5).foreach(i => rb.add(tr(i)))
    val counts = rb.sample(10000, new Rng(2)).groupBy(_.a).view.mapValues(_.length).toMap
    (1 to 5).foreach(i => assert(counts(i.toDouble) > 1500, s"$counts"))
  }
}
