package repro.bench

import repro.graphgen.Scenario
import repro.harness.{BenchConfig, Tables}

/** Tables V and XII — transferability of WSD-L: a policy trained on one
  * category applied to every test graph (triangle ARE), plus WSD-H.
  */
abstract class TransferTable(scenario: Scenario, tableId: String, title: String)
    extends BenchTable {

  test(s"$title: cross-category policy transfer") {
    val rows = Tables.transferTable(spark, scenario, BenchConfig.benchEdges)
    println(Tables.renderAreTable(title, rows))
    val header = "graph" +: rows.head._2.map(_._1)
    Tables.writeTsv(tableId, header,
      rows.map { case (ds, cells) => ds +: cells.map(c => f"${c._2 * 100}%.4f") })
    rows.foreach { case (ds, cells) =>
      cells.foreach { case (src, v) =>
        assert(!v.isNaN && !v.isInfinite && v >= 0, s"$ds/$src")
      }
    }
  }
}

/** Table V — transferability under massive deletion. */
class Table05TransferMassive
  extends TransferTable(Scenario.Massive(), "table05_transfer_massive",
    "Table V — WSD-L transferability (massive deletion, triangle ARE %)")

/** Table XII — transferability under light deletion. */
class Table12TransferLight
  extends TransferTable(Scenario.Light(), "table12_transfer_light",
    "Table XII — WSD-L transferability (light deletion, triangle ARE %)")
