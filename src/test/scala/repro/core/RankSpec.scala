package repro.core

import org.scalatest.funsuite.AnyFunSuite

class RankSpec extends AnyFunSuite {

  test("rank is at least the weight") {
    val rng = new Rng(1)
    (1 to 1000).foreach { _ =>
      val w = rng.nextDouble() * 10 + 0.1
      assert(Rank.draw(w, rng) >= w)
    }
  }

  test("non-positive weight rejected") {
    intercept[IllegalArgumentException](Rank.draw(0.0, new Rng(1)))
    intercept[IllegalArgumentException](Rank.draw(-1.0, new Rng(1)))
  }

  test("inclusionProb formula") {
    assert(Rank.inclusionProb(2.0, 0.0) == 1.0)  // τ = 0 ⇒ certain
    assert(Rank.inclusionProb(2.0, 4.0) == 0.5)
    assert(Rank.inclusionProb(5.0, 4.0) == 1.0)  // capped at 1
    assert(Rank.inclusionProb(1.0, 1000.0) == 0.001)
  }

  test("empirical P[r > τ] matches min(1, w/τ)") {
    val rng = new Rng(2)
    for ((w, tau) <- Seq((1.0, 2.0), (3.0, 10.0), (2.0, 1.5), (1.0, 1.0))) {
      val n = 200000
      var hits = 0
      (1 to n).foreach { _ => if (Rank.draw(w, rng) > tau) hits += 1 }
      val expected = Rank.inclusionProb(w, tau)
      assert(math.abs(hits.toDouble / n - expected) < 0.005,
        s"w=$w tau=$tau got ${hits.toDouble / n} expected $expected")
    }
  }

  test("higher weight stochastically dominates") {
    val rng = new Rng(3)
    val n = 50000
    var wins = 0
    (1 to n).foreach { _ => if (Rank.draw(5.0, rng) > Rank.draw(1.0, rng)) wins += 1 }
    assert(wins.toDouble / n > 0.8, s"only $wins/$n")
  }
}
