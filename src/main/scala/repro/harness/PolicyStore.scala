package repro.harness

import scala.collection.concurrent.TrieMap
import repro.core.{Pattern, TemporalAgg}
import repro.graphgen.{Datasets, Scenario}
import repro.rl.Training

/** Caches one trained WSD-L policy per (training category, scenario,
  * pattern, temporal aggregation), mirroring the paper's protocol: for each
  * test graph the policy is trained on the *other* graph of the same
  * category (Table I), on several streams generated with the scenario's
  * parameters (paper: 10 streams; scaled here, see BenchConfig).
  *
  * Training wall time is retained for the Table IV / XI reproductions.
  */
object PolicyStore {

  final case class Key(category: String, scenario: String, pattern: String, agg: String)

  private val cache = TrieMap.empty[Key, Training.Trained]

  def trained(
      category: String,
      scenario: Scenario,
      pattern: Pattern,
      agg: TemporalAgg = TemporalAgg.Max,
  ): Training.Trained = {
    val key = Key(category, scenario.label, pattern.name, agg.label)
    cache.getOrElseUpdate(key, {
      val edges = Datasets.train(category, BenchConfig.trainEdges)
      val m = BenchConfig.mFor(edges.length)
      val streams = (0 until BenchConfig.trainStreams).map { i =>
        scenario.build(edges, seed = 555L + 31L * i + key.hashCode)
      }
      Training.trainPolicy(streams, pattern, m,
        seed = 9090L + key.hashCode, temporalAgg = agg, gradSteps = BenchConfig.gradSteps)
    })
  }
}
