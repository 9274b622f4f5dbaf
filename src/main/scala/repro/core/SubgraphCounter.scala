package repro.core

/** A one-pass subgraph-count estimator over a fully dynamic edge stream.
  *
  * Implementations process each event exactly once in arrival order under a
  * fixed memory budget of `M` sampled edges (Definition 1) and expose the
  * running count estimate at any time.
  */
trait SubgraphCounter {
  /** Algorithm name as used in the paper's table columns. */
  def name: String
  /** Process one edge insertion/deletion event. */
  def process(ev: EdgeEvent): Unit
  /** Current estimate of the number of pattern instances in the graph. */
  def estimate: Double
  /** Number of edges currently stored (≤ M; for diagnostics/tests). */
  def sampleSize: Int
}
