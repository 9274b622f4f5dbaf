package repro.harness

import java.nio.file.{Files, Paths}
import org.scalatest.funsuite.AnyFunSuite

class TablesSpec extends AnyFunSuite {

  private val rows = Seq(
    Tables.MetricRow("g1", 100, Seq("A" -> Tables.Cell(0.01, 0.02, 1.5), "B" -> Tables.Cell(0.10, 0.2, 2.5))),
    Tables.MetricRow("g2", 200, Seq("A" -> Tables.Cell(0.03, 0.04, 0.5), "B" -> Tables.Cell(0.30, 0.4, 0.7))),
  )

  test("renderMetricTable contains all sections and cells") {
    val s = Tables.renderMetricTable("T", rows)
    assert(s.contains("Absolute Relative Error"))
    assert(s.contains("Mean Absolute Relative Error"))
    assert(s.contains("Running Time"))
    assert(s.contains("g1") && s.contains("g2"))
    assert(s.contains("1.000")) // 0.01 → 1.000 %
    assert(s.contains("30.000"))
  }

  test("renderAreTable renders percentages") {
    val s = Tables.renderAreTable("T2", Seq("g" -> Seq("X" -> 0.015, "Y" -> 0.025)))
    assert(s.contains("1.500") && s.contains("2.500") && s.contains("X"))
  }

  test("writeTsv and writeMetricTsv produce parseable files") {
    val dir = Files.createTempDirectory("tables-spec")
    val old = sys.props.get("repro.results.dir")
    sys.props("repro.results.dir") = dir.toString
    try {
      Tables.writeTsv("unit_test_table", Seq("a", "b"), Seq(Seq("1", "2"), Seq("3", "4")))
      val lines = Files.readAllLines(dir.resolve("unit_test_table.tsv"))
      assert(lines.size == 3 && lines.get(0) == "a\tb" && lines.get(2) == "3\t4")

      Tables.writeMetricTsv("unit_test_metric", rows)
      val mlines = Files.readAllLines(dir.resolve("unit_test_metric.tsv"))
      assert(mlines.size == 3)
      assert(mlines.get(0).split("\t").length == 1 + 2 * 3) // graph + 2 algs × 3 metrics
    } finally {
      old match { case Some(v) => sys.props("repro.results.dir") = v
                  case None => sys.props.remove("repro.results.dir") }
    }
  }
}
