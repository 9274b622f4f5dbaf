package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.rl.TrainedPolicy

class WeightFunctionSpec extends AnyFunSuite {

  test("constant weight is 1 regardless of state") {
    assert(ConstantWeight.weight(Array(100.0, 5.0, 5.0)) == 1.0)
    assert(ConstantWeight.weight(Array(0.0, 0.0, 0.0)) == 1.0)
    assert(!ConstantWeight.needsTemporal)
  }

  test("heuristic weight is 9·|H| + 1 (the GPS rule)") {
    assert(HeuristicWeight.weight(Array(0.0, 3.0, 4.0)) == 1.0)
    assert(HeuristicWeight.weight(Array(2.0, 3.0, 4.0)) == 19.0)
    assert(HeuristicWeight.weight(Array(10.0, 0.0, 0.0)) == 91.0)
    assert(!HeuristicWeight.needsTemporal)
    assert(HeuristicWeight.name == "WSD-H")
  }

  test("trained policy needs temporal features and stays positive") {
    val p = TrainedPolicy(Array(-5.0, -5.0, -5.0), -10.0,
      Array(0.0, 0.0, 0.0), Array(1.0, 1.0, 1.0))
    assert(p.needsTemporal)
    assert(p.weight(Array(10.0, 10.0, 10.0)) > 0.0)
  }

  test("temporal aggregation labels") {
    assert(TemporalAgg.Max.label == "Max" && TemporalAgg.Avg.label == "Avg")
  }
}
