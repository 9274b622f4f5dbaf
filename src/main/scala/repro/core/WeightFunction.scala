package repro.core

/** Weight function `W(e, R)` for weighted samplers (Section IV).
  *
  * All weight functions see the same MDP state vector of Eq. (22):
  * `state = [ |H_k|, |N(u)|, |N(v)|, v_1, ..., v_|H| ]` — the number of
  * pattern instances closed by the new edge against the reservoir, the
  * sampled degrees of its endpoints, and the temporal feature vector
  * (aggregated arrival times of the instances' edges; zeros when the edge
  * closes no instance). This keeps the heuristic and RL policies plug-in
  * compatible.
  */
trait WeightFunction extends Serializable {
  /** Positive weight for the edge whose MDP state is `state`. */
  def weight(state: Array[Double]): Double
  /** Name used in table rows (e.g. "WSD-H"). */
  def name: String
  /** Whether the temporal features `v_1..v_|H|` must be materialised —
    * heuristics ignore them, so the sampler can skip the per-instance sort. */
  def needsTemporal: Boolean = false
}

/** Uniform weights — turns WSD into an unweighted priority sampler. */
case object ConstantWeight extends WeightFunction {
  override def weight(state: Array[Double]): Double = 1.0
  override val name = "const"
}

/** The GPS heuristic of [14] used by WSD-H: `W(e, R) = 9·|H(e)| + 1`. */
case object HeuristicWeight extends WeightFunction {
  override def weight(state: Array[Double]): Double = 9.0 * state(0) + 1.0
  override val name = "WSD-H"
}

/** How the per-instance arrival times are folded into `v_j` (Eq. 20).
  * The paper uses Max; the ablation of Table XIII compares against Avg.
  */
sealed trait TemporalAgg extends Serializable { def label: String }
object TemporalAgg {
  case object Max extends TemporalAgg { val label = "Max" }
  case object Avg extends TemporalAgg { val label = "Avg" }
}
