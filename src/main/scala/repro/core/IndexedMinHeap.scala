package repro.core

import scala.collection.mutable

/** Binary min-heap over (edge key → rank) supporting delete-by-key.
  *
  * WSD, GPS and GPS-A all need a min-priority queue keyed by rank *and*
  * O(log n) removal of an arbitrary edge (fully dynamic deletions), which
  * `java.util.PriorityQueue` cannot do without an O(n) scan. Positions are
  * tracked in a hash map.
  */
final class IndexedMinHeap(initialCapacity: Int = 16) extends Serializable {
  private var keys  = new Array[Long](math.max(initialCapacity, 4))
  private var ranks = new Array[Double](keys.length)
  private val pos   = mutable.HashMap.empty[Long, Int]
  private var n     = 0

  def size: Int = n
  def isEmpty: Boolean = n == 0
  def contains(key: Long): Boolean = pos.contains(key)

  /** Rank of the minimum element; throws on empty heap. */
  def minRank: Double = { require(n > 0, "minRank on empty heap"); ranks(0) }

  /** Key of the minimum element; throws on empty heap. */
  def minKey: Long = { require(n > 0, "minKey on empty heap"); keys(0) }

  /** Insert a key with the given rank; the key must not be present. */
  def insert(key: Long, rank: Double): Unit = {
    require(!pos.contains(key), s"duplicate heap key $key")
    if (n == keys.length) grow()
    keys(n) = key; ranks(n) = rank; pos(key) = n
    n += 1
    siftUp(n - 1)
  }

  /** Remove and return the minimum (key, rank). */
  def popMin(): (Long, Double) = {
    require(n > 0, "popMin on empty heap")
    val k = keys(0); val r = ranks(0)
    removeAt(0)
    (k, r)
  }

  /** Remove an arbitrary key; returns false if it was absent. */
  def removeKey(key: Long): Boolean =
    pos.get(key) match {
      case Some(i) => removeAt(i); true
      case None    => false
    }

  /** All (key, rank) pairs in heap order (internal order, not sorted). */
  def entries: Iterator[(Long, Double)] =
    Iterator.tabulate(n)(i => (keys(i), ranks(i)))

  private def grow(): Unit = {
    keys = java.util.Arrays.copyOf(keys, keys.length * 2)
    ranks = java.util.Arrays.copyOf(ranks, ranks.length * 2)
  }

  private def removeAt(i: Int): Unit = {
    pos.remove(keys(i))
    n -= 1
    if (i != n) {
      keys(i) = keys(n); ranks(i) = ranks(n); pos(keys(i)) = i
      siftDown(i); siftUp(i)
    }
  }

  private def swap(i: Int, j: Int): Unit = {
    val k = keys(i); keys(i) = keys(j); keys(j) = k
    val r = ranks(i); ranks(i) = ranks(j); ranks(j) = r
    pos(keys(i)) = i; pos(keys(j)) = j
  }

  @annotation.tailrec
  private def siftUp(i: Int): Unit =
    if (i > 0) {
      val p = (i - 1) >> 1
      if (ranks(i) < ranks(p)) { swap(i, p); siftUp(p) }
    }

  @annotation.tailrec
  private def siftDown(i: Int): Unit = {
    val l = 2 * i + 1; val r = l + 1
    var m = i
    if (l < n && ranks(l) < ranks(m)) m = l
    if (r < n && ranks(r) < ranks(m)) m = r
    if (m != i) { swap(i, m); siftDown(m) }
  }
}
