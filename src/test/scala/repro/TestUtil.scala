package repro

import repro.core.{Adjacency, Edge, EdgeEvent, Rng}
import scala.collection.mutable

/** Shared helpers for the test suites: brute-force subgraph counts
  * (independent of the production enumeration code) and tiny graph/stream
  * builders.
  */
object TestUtil {

  /** Build an adjacency from (u, v) pairs. */
  def adjacency(edges: Iterable[(Int, Int)]): Adjacency = {
    val a = new Adjacency
    edges.foreach { case (u, v) => a.add(u, v) }
    a
  }

  def keysToPairs(keys: Array[Long]): Seq[(Int, Int)] =
    keys.toSeq.map(k => (Edge.u(k), Edge.v(k)))

  /** Brute-force wedge count: Σ_v C(deg v, 2). */
  def bruteWedges(edges: Iterable[(Int, Int)]): Long = {
    val deg = mutable.HashMap.empty[Int, Long].withDefaultValue(0L)
    edges.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    deg.values.map(d => d * (d - 1) / 2).sum
  }

  /** Brute-force triangle count via vertex triples. */
  def bruteTriangles(edges: Iterable[(Int, Int)]): Long = {
    val es = edges.map { case (u, v) => Edge.key(u, v) }.toSet
    val vs = edges.flatMap { case (u, v) => Seq(u, v) }.toSeq.distinct.sorted
    var c = 0L
    for {
      i <- vs.indices; j <- (i + 1) until vs.size
      if es.contains(Edge.key(vs(i), vs(j)))
      k <- (j + 1) until vs.size
      if es.contains(Edge.key(vs(i), vs(k))) && es.contains(Edge.key(vs(j), vs(k)))
    } c += 1
    c
  }

  /** Brute-force 4-clique count via vertex quadruples. */
  def bruteFourCliques(edges: Iterable[(Int, Int)]): Long = {
    val es = edges.map { case (u, v) => Edge.key(u, v) }.toSet
    val vs = edges.flatMap { case (u, v) => Seq(u, v) }.toSeq.distinct.sorted
    var c = 0L
    for {
      i <- vs.indices; j <- (i + 1) until vs.size
      if es.contains(Edge.key(vs(i), vs(j)))
      k <- (j + 1) until vs.size
      if es.contains(Edge.key(vs(i), vs(k))) && es.contains(Edge.key(vs(j), vs(k)))
      l <- (k + 1) until vs.size
      if es.contains(Edge.key(vs(i), vs(l))) && es.contains(Edge.key(vs(j), vs(l))) &&
        es.contains(Edge.key(vs(k), vs(l)))
    } c += 1
    c
  }

  /** Complete graph on n vertices as edge pairs. */
  def clique(n: Int): Seq[(Int, Int)] =
    for (i <- 0 until n; j <- (i + 1) until n) yield (i, j)

  /** A feasible random fully dynamic event sequence over `nVertices`
    * vertices: each step inserts an absent or deletes a present edge.
    */
  def randomEvents(nVertices: Int, steps: Int, seed: Long, deleteBias: Double = 0.35): Array[EdgeEvent] = {
    val maxEdges = nVertices.toLong * (nVertices - 1) / 2
    require(deleteBias > 0 || steps <= maxEdges,
      s"insertion-only sequence of $steps steps cannot fit in K$nVertices ($maxEdges edges)")
    val rng = new Rng(seed)
    val present = mutable.ArrayBuffer.empty[Long]
    val idx = mutable.HashMap.empty[Long, Int]
    val out = mutable.ArrayBuffer.empty[EdgeEvent]
    var s = 0
    while (s < steps) {
      // when the graph is (nearly) complete, insertion attempts cannot make
      // progress — force a deletion instead
      val full = present.length == maxEdges
      val doDelete = present.nonEmpty && (full || rng.nextDouble() < deleteBias)
      if (doDelete) {
        val i = rng.nextInt(present.length)
        val k = present(i)
        val last = present.remove(present.length - 1)
        idx.remove(k)
        if (i < present.length) { present(i) = last; idx(last) = i }
        out += EdgeEvent(insert = false, Edge.u(k), Edge.v(k))
        s += 1
      } else {
        val u = rng.nextInt(nVertices); val v = rng.nextInt(nVertices)
        if (u != v && !idx.contains(Edge.key(u, v))) {
          val k = Edge.key(u, v)
          idx(k) = present.length; present += k
          out += EdgeEvent(insert = true, u, v)
          s += 1
        }
      }
    }
    out.toArray
  }

  /** Mean and standard error of the mean. */
  def meanSem(xs: Seq[Double]): (Double, Double) = {
    val n = xs.size
    val mean = xs.sum / n
    val varr = xs.map(x => (x - mean) * (x - mean)).sum / math.max(1, n - 1)
    (mean, math.sqrt(varr / n))
  }
}
