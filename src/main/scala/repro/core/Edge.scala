package repro.core

/** Canonical undirected-edge encoding.
  *
  * An edge between vertices `u` and `v` (32-bit non-negative ids) is packed
  * into a single `Long` as `(min << 32) | max`, so edges compare/hash as
  * primitives and adjacency structures can key on a `Long`.
  */
object Edge {

  /** Pack an undirected edge into its canonical 64-bit key. */
  @inline def key(u: Int, v: Int): Long = {
    val a = math.min(u, v); val b = math.max(u, v)
    (a.toLong << 32) | (b.toLong & 0xffffffffL)
  }

  /** Smaller endpoint of a packed edge key. */
  @inline def u(k: Long): Int = (k >>> 32).toInt

  /** Larger endpoint of a packed edge key. */
  @inline def v(k: Long): Int = (k & 0xffffffffL).toInt
}

/** One event of a fully dynamic graph stream: insert (`insert = true`) or
  * delete (`insert = false`) the undirected edge `(u, v)`.
  */
final case class EdgeEvent(insert: Boolean, u: Int, v: Int) {
  /** Canonical key of the event's edge. */
  def key: Long = Edge.key(u, v)
}
