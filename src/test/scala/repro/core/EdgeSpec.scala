package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Properties}

class EdgeSpec extends AnyFunSuite {

  test("key packs min into high bits, max into low bits") {
    assert(Edge.key(3, 7) == ((3L << 32) | 7L))
    assert(Edge.key(7, 3) == ((3L << 32) | 7L))
  }

  test("round trip on a deterministic sweep") {
    val rng = new Rng(1)
    (1 to 5000).foreach { _ =>
      val a = rng.nextInt(1 << 30); val b = rng.nextInt(1 << 30)
      val k = Edge.key(a, b)
      assert(Edge.u(k) == math.min(a, b))
      assert(Edge.v(k) == math.max(a, b))
      assert(k == Edge.key(b, a))
    }
  }

  test("EdgeEvent.key matches Edge.key") {
    assert(EdgeEvent(insert = true, 9, 2).key == Edge.key(2, 9))
    assert(EdgeEvent(insert = false, 2, 9).key == Edge.key(2, 9))
  }
}

/** ScalaCheck properties for the edge key encoding. */
object EdgeProps extends Properties("Edge") {
  private val vertex = Gen.chooseNum(0, Int.MaxValue)

  property("symmetric") = Prop.forAll(vertex, vertex) { (u, v) =>
    Edge.key(u, v) == Edge.key(v, u)
  }

  property("roundTrip") = Prop.forAll(vertex, vertex) { (a, b) =>
    val k = Edge.key(a, b)
    Edge.u(k) == math.min(a, b) && Edge.v(k) == math.max(a, b)
  }

  property("injective") = Prop.forAll(vertex, vertex, vertex, vertex) { (a, b, c, d) =>
    val e1 = (math.min(a, b), math.max(a, b))
    val e2 = (math.min(c, d), math.max(c, d))
    (e1 == e2) == (Edge.key(a, b) == Edge.key(c, d))
  }
}
