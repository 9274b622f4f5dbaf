package repro.bench

import repro.graphgen.Scenario
import repro.harness.{BenchConfig, Tables}

/** Table XIII — ablation of the temporal state features: WSD-L with the
  * paper's Max aggregation (Eq. 20) vs the Avg variant vs WSD-H, triangle
  * ARE under both deletion scenarios.
  */
class Table13Ablation extends BenchTable {

  test("Table XIII: WSD-L (Max) vs WSD-L (Avg) vs WSD-H") {
    Seq(("massive", Scenario.Massive()): (String, Scenario),
        ("light", Scenario.Light())).foreach { case (label, scenario) =>
      val rows = Tables.ablationTable(spark, scenario, BenchConfig.benchEdges)
      println(Tables.renderAreTable(s"Table XIII — ablation ($label deletion, triangle ARE %)", rows))
      val header = "graph" +: rows.head._2.map(_._1)
      Tables.writeTsv(s"table13_ablation_$label", header,
        rows.map { case (ds, cells) => ds +: cells.map(c => f"${c._2 * 100}%.4f") })
      rows.foreach { case (ds, cells) =>
        cells.foreach { case (alg, v) => assert(!v.isNaN && v >= 0, s"$ds/$alg") }
      }
    }
  }
}
