package repro.core

/** The rank function `r = f(w) = w / u`, `u ~ Uniform(0, 1]`, shared by
  * GPS, GPS-A and WSD (Section III).
  *
  * Under this rank function `P[r > τ] = min(1, w/τ)` for `τ > 0`, and 1 for
  * `τ = 0` (the paper defines thresholds to start at 0, where every edge is
  * sampled for sure).
  */
object Rank {

  /** Draw a rank for weight `w` using randomness from `rng`. */
  def draw(w: Double, rng: Rng): Double = {
    require(w > 0, s"edge weight must be positive, got $w")
    w / rng.nextOpenClosed()
  }

  /** Inclusion probability `P[r(e) > τ]` for an edge of weight `w`. */
  def inclusionProb(w: Double, tau: Double): Double =
    if (tau <= 0.0) 1.0 else math.min(1.0, w / tau)
}
