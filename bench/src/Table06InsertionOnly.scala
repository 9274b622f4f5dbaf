package repro.bench

import repro.core.Triangle
import repro.graphgen.Scenario
import repro.harness.{Algorithms, Tables}

/** Table VI — insertion-only triangle counting on cit-PT: WSD-L vs GPS
  * (WSD-H and GPS-A reduce to GPS without deletions) vs the uniform
  * baselines.
  */
class Table06InsertionOnly extends BenchTable {

  test("Table VI: insertion-only triangle counting on cit-PT") {
    val rows = runMetricTable("table06_insertion_only",
      "Table VI — triangles, insertion-only (cit-PT)", Triangle,
      Scenario.InsertOnly, Seq("cit"), benchEdges, Algorithms.insertionOnly)
    // paper shape: the weighted samplers (WSD-L, GPS) lead on ARE
    val cells = rows.head.cells.toMap
    val weightedBest = Seq("WSD-L", "GPS").map(cells(_).are).min
    val uniformWorst = Seq("Triest", "ThinkD", "WRS").map(cells(_).are).max
    assert(weightedBest <= uniformWorst,
      s"weighted best $weightedBest vs uniform worst $uniformWorst")
  }
}
