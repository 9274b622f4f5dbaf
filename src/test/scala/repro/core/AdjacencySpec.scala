package repro.core

import org.scalatest.funsuite.AnyFunSuite

class AdjacencySpec extends AnyFunSuite {

  test("add/contains/degree/neighbors") {
    val a = new Adjacency
    a.add(1, 2); a.add(1, 3)
    assert(a.contains(1, 2) && a.contains(2, 1))
    assert(!a.contains(2, 3))
    assert(a.degree(1) == 2 && a.degree(2) == 1 && a.degree(9) == 0)
    assert(a.neighbors(1) == Set(2, 3))
    assert(a.neighbors(9).isEmpty)
    assert(a.edgeCount == 2)
  }

  test("remove is symmetric and updates counts") {
    val a = new Adjacency
    a.add(1, 2); a.add(2, 3)
    a.remove(2, 1)
    assert(!a.contains(1, 2))
    assert(a.contains(2, 3))
    assert(a.edgeCount == 1)
  }

  test("self loops rejected") {
    val a = new Adjacency
    intercept[IllegalArgumentException](a.add(5, 5))
  }

  test("duplicate edge rejected") {
    val a = new Adjacency
    a.add(1, 2)
    intercept[IllegalArgumentException](a.add(2, 1))
  }

  test("removing absent edge rejected") {
    val a = new Adjacency
    intercept[IllegalArgumentException](a.remove(1, 2))
  }

  test("randomized differential vs reference set") {
    val rng = new Rng(3)
    val a = new Adjacency
    val ref = scala.collection.mutable.HashSet.empty[Long]
    (1 to 5000).foreach { _ =>
      val u = rng.nextInt(40); val v = rng.nextInt(40)
      if (u != v) {
        val k = Edge.key(u, v)
        if (ref.contains(k)) { a.remove(u, v); ref.remove(k) }
        else { a.add(u, v); ref.add(k) }
      }
    }
    assert(a.edgeCount == ref.size)
    ref.foreach(k => assert(a.contains(Edge.u(k), Edge.v(k))))
  }
}
