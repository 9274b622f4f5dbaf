package repro.harness

import repro.baselines.{ThinkD, Triest, WRS}
import repro.core.{GPSA, HeuristicWeight, Pattern, SubgraphCounter, TemporalAgg, WSD}
import repro.rl.TrainedPolicy

/** Factory mapping the paper's algorithm column names to counters. */
object Algorithms {

  /** Column order of Tables II/III/VII–X. */
  val fullyDynamic: Seq[String] = Seq("WSD-L", "WSD-H", "GPS-A", "Triest", "ThinkD", "WRS")

  /** Column order of Table VI (insertion-only; GPS-A and WSD-H reduce to GPS). */
  val insertionOnly: Seq[String] = Seq("WSD-L", "GPS", "Triest", "ThinkD", "WRS")

  /** Build a named counter. `policy` is required for WSD-L. */
  def make(
      alg: String,
      pattern: Pattern,
      m: Int,
      seed: Long,
      policy: TrainedPolicy = null,
      agg: TemporalAgg = TemporalAgg.Max,
  ): SubgraphCounter = alg match {
    case "WSD-L" =>
      require(policy != null, "WSD-L needs a trained policy")
      new WSD(pattern, m, policy, seed, agg, name = "WSD-L")
    case "WSD-H" => new WSD(pattern, m, HeuristicWeight, seed, agg, name = "WSD-H")
    case "GPS-A" => new GPSA(pattern, m, HeuristicWeight, seed)
    case "GPS"   => GPSA.gps(pattern, m, HeuristicWeight, seed)
    case "Triest" => new Triest(pattern, m, seed)
    case "ThinkD" => new ThinkD(pattern, m, seed)
    case "WRS"    => new WRS(pattern, m, seed)
    case other    => throw new IllegalArgumentException(s"unknown algorithm $other")
  }
}
