package repro.graphgen

import scala.collection.mutable
import repro.core.{Edge, Rng}

/** Seeded synthetic graph generators.
  *
  * Each generator returns edges as canonical keys in *generation order* —
  * the paper's "natural order" of the stream. All graphs are simple and
  * undirected (no self loops, no duplicates), matching the paper's
  * preprocessing.
  */
object Generators {

  /** Forest Fire (Leskovec et al., TKDD'07) — the model the paper uses for
    * its synthetic data (`G(n, p)` where `p` controls density). Each new
    * vertex picks a random ambassador and "burns" outward: every neighbor
    * of a burning vertex catches fire independently with probability `p`.
    * `burnCap` bounds the burn per arriving vertex so density stays
    * laptop-scale at high `p`.
    */
  def forestFire(n: Int, p: Double, seed: Long, burnCap: Int = 40): Array[Long] = {
    require(n >= 2, "forestFire needs at least 2 vertices")
    val rng = new Rng(seed)
    val adj = mutable.ArrayBuffer.fill(n)(mutable.ArrayBuffer.empty[Int])
    val edges = mutable.ArrayBuffer.empty[Long]

    def link(a: Int, b: Int): Unit = {
      adj(a) += b; adj(b) += a
      edges += Edge.key(a, b)
    }

    link(0, 1)
    var v = 2
    while (v < n) {
      val burned = mutable.HashSet.empty[Int]
      val queue  = mutable.Queue.empty[Int]
      val amb = rng.nextInt(v)
      burned += amb; queue.enqueue(amb)
      var nLinks = 0
      while (queue.nonEmpty && nLinks < burnCap) {
        val w = queue.dequeue()
        link(v, w); nLinks += 1
        val neigh = adj(w)
        var i = 0
        while (i < neigh.length && nLinks + queue.length < burnCap) {
          val x = neigh(i)
          if (x != v && !burned.contains(x) && rng.nextDouble() < p) {
            burned += x; queue.enqueue(x)
          }
          i += 1
        }
      }
      v += 1
    }
    dedup(edges)
  }

  /** Barabási–Albert preferential attachment with `m` links per new vertex —
    * heavy-tailed degrees, the proxy for the social-network category.
    */
  def barabasiAlbert(n: Int, m: Int, seed: Long): Array[Long] = {
    require(n > m && m >= 1, s"need n > m >= 1, got n=$n m=$m")
    val rng = new Rng(seed)
    val targets = mutable.ArrayBuffer.empty[Int] // degree-proportional urn
    val edges = mutable.ArrayBuffer.empty[Long]
    // seed clique over the first m+1 vertices
    for (i <- 0 to m; j <- (i + 1) to m) {
      edges += Edge.key(i, j); targets += i; targets += j
    }
    var v = m + 1
    while (v < n) {
      val chosen = mutable.HashSet.empty[Int]
      while (chosen.size < m) chosen += targets(rng.nextInt(targets.length))
      chosen.foreach { w =>
        edges += Edge.key(v, w)
        targets += v; targets += w
      }
      v += 1
    }
    dedup(edges)
  }

  /** Planted-partition community graph — the proxy for the community
    * category: `k` communities of `size` vertices, intra-community edges
    * with probability `pIn`, plus `interEdges` random cross-community
    * edges. Vertices are emitted community by community (natural order).
    */
  def plantedPartition(k: Int, size: Int, pIn: Double, interEdges: Int, seed: Long): Array[Long] = {
    val rng = new Rng(seed)
    val edges = mutable.ArrayBuffer.empty[Long]
    val n = k * size
    for (c <- 0 until k) {
      val base = c * size
      for (i <- 0 until size; j <- (i + 1) until size)
        if (rng.nextDouble() < pIn) edges += Edge.key(base + i, base + j)
    }
    val seen = mutable.HashSet.empty[Long] ++ edges
    var added = 0
    while (added < interEdges) {
      val u = rng.nextInt(n); val v = rng.nextInt(n)
      if (u != v && u / size != v / size) {
        val key = Edge.key(u, v)
        if (seen.add(key)) { edges += key; added += 1 }
      }
    }
    dedup(edges)
  }

  /** Erdős–Rényi G(n, m) — a structureless control used in tests. */
  def erdosRenyi(n: Int, m: Int, seed: Long): Array[Long] = {
    require(m.toLong <= n.toLong * (n - 1) / 2, "too many edges requested")
    val rng = new Rng(seed)
    val seen = mutable.HashSet.empty[Long]
    val edges = mutable.ArrayBuffer.empty[Long]
    while (edges.length < m) {
      val u = rng.nextInt(n); val v = rng.nextInt(n)
      if (u != v) {
        val key = Edge.key(u, v)
        if (seen.add(key)) edges += key
      }
    }
    edges.toArray
  }

  /** Drop duplicate keys, keeping first occurrence (generation order). */
  private def dedup(edges: mutable.ArrayBuffer[Long]): Array[Long] = {
    val seen = mutable.HashSet.empty[Long]
    val out = mutable.ArrayBuffer.empty[Long]
    edges.foreach { k => if (seen.add(k)) out += k }
    out.toArray
  }
}
