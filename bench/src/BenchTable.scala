package repro.bench

import repro.SparkSpec
import repro.core.Pattern
import repro.graphgen.Scenario
import repro.harness.{Algorithms, BenchConfig, Tables}

/** Base for the per-table bench suites: runs a table through the shared
  * harness, prints it in the paper's layout, persists the TSV, and applies
  * loose sanity assertions (metrics finite; a weighted sampler beats the
  * *worst* uniform baseline — the paper's headline ordering — while exact
  * magnitudes are left to EXPERIMENTS.md).
  */
trait BenchTable extends SparkSpec {

  /** Run, print, persist and sanity-check one metric table. */
  def runMetricTable(
      id: String,
      title: String,
      pattern: Pattern,
      scenario: Scenario,
      categories: Seq[String],
      nEdges: Int,
      algs: Seq[String] = Algorithms.fullyDynamic,
      sampleRatio: Double = BenchConfig.sampleRatio,
  ): Seq[Tables.MetricRow] = {
    val rows = Tables.metricTable(spark, pattern, scenario, categories, nEdges, algs, sampleRatio)
    val rendered = Tables.renderMetricTable(title, rows)
    println(rendered)
    Tables.writeMetricTsv(id, rows)
    rows.foreach { r =>
      r.cells.foreach { case (alg, c) =>
        assert(!c.are.isNaN && !c.are.isInfinite, s"${r.dataset}/$alg ARE")
        assert(!c.mare.isNaN && !c.mare.isInfinite, s"${r.dataset}/$alg MARE")
        assert(c.seconds > 0, s"${r.dataset}/$alg time")
      }
    }
    rows
  }

  /** Paper-shape check: the best weighted sampler should beat the worst
    * uniform baseline on most datasets (strict per-cell dominance is too
    * noisy at this scale to assert).
    */
  def assertWeightedBeatsWorstUniform(rows: Seq[Tables.MetricRow]): Unit = {
    val wins = rows.count { r =>
      val cells = r.cells.toMap
      val weighted = Seq("WSD-L", "WSD-H").flatMap(cells.get).map(_.are)
      val uniform = Seq("Triest", "ThinkD", "WRS").flatMap(cells.get).map(_.are)
      weighted.nonEmpty && uniform.nonEmpty && weighted.min <= uniform.max
    }
    assert(wins * 2 >= rows.size,
      s"weighted sampling lost to every uniform baseline on ${rows.size - wins}/${rows.size} datasets")
  }

  /** Paper-shape check for regimes where uniform samplers are competitive
    * at this scale (massive deletion): the RL-learned weighting must still
    * beat the heuristic on most datasets (the paper's core contribution).
    */
  def assertLearnedBeatsHeuristic(rows: Seq[Tables.MetricRow]): Unit = {
    val wins = rows.count { r =>
      val cells = r.cells.toMap
      (cells.get("WSD-L"), cells.get("WSD-H")) match {
        case (Some(l), Some(h)) => l.are <= h.are * 1.1
        case _ => true
      }
    }
    assert(wins * 2 >= rows.size,
      s"WSD-L lost to WSD-H on ${rows.size - wins}/${rows.size} datasets")
  }

  def defaultMassive: Scenario = Scenario.Massive(alphaEvents = 4.0, beta = 0.8)
  def defaultLight: Scenario = Scenario.Light(beta = 0.2)
  def benchEdges: Int = BenchConfig.benchEdges
  def cliqueEdges: Int = BenchConfig.cliqueEdges
}
