package repro.harness

import java.nio.file.{Files, Paths, StandardOpenOption}
import org.apache.spark.sql.SparkSession
import repro.core.{Pattern, TemporalAgg, Triangle}
import repro.graphgen.{Datasets, Scenario}

/** Shared builders for every evaluation table. Both the `bench/` suites and
  * the `jobs/` spark-submit entrypoints call these, so a table is produced
  * by exactly one code path.
  *
  * Results are printed in the paper's layout and appended as TSV under
  * `bench-results/` for diffing against the paper in EXPERIMENTS.md.
  */
object Tables {

  /** Aggregated metrics of one (dataset, algorithm) cell: means over trials. */
  final case class Cell(are: Double, mare: Double, seconds: Double)

  /** One dataset row of a metric table. */
  final case class MetricRow(dataset: String, nEvents: Int, cells: Seq[(String, Cell)])

  private def streamSeed(category: String): Long = 1000L + category.hashCode

  /** Build the evaluation stream + ground truth for one dataset.
    *
    * Under massive deletion, a wipe landing in the stream's last few percent
    * leaves a near-empty graph whose *relative* errors are meaningless at
    * this scale (the paper's graphs keep ≥10⁸ instances at all times). We
    * therefore probe a few deterministic seeds and keep the first whose
    * end-of-stream truth is at least 10% of the peak truth — a documented
    * evaluation-protocol choice, not per-algorithm tuning (all algorithms
    * see the same stream).
    */
  private[harness] def buildStream(
      edges: Array[Long],
      scenario: Scenario,
      pattern: Pattern,
      baseSeed: Long,
  ): (Array[repro.core.EdgeEvent], TrialRunner.TruthSeries) = {
    var best: (Array[repro.core.EdgeEvent], TrialRunner.TruthSeries) = null
    var attempt = 0
    while (attempt < 5) {
      val stream = scenario.build(edges, baseSeed + attempt)
      val truth = TrialRunner.truth(stream, pattern, BenchConfig.checkpoints)
      if (best == null) best = (stream, truth)
      if (truth.finalTruth >= 0.1 * truth.values.max) return (stream, truth)
      attempt += 1
    }
    best
  }

  /** Evaluate `algs` on one dataset under `scenario`; mean over trials. */
  def evaluateDataset(
      spark: SparkSession,
      category: String,
      pattern: Pattern,
      scenario: Scenario,
      nEdges: Int,
      algs: Seq[String],
      agg: TemporalAgg = TemporalAgg.Max,
      sampleRatio: Double = BenchConfig.sampleRatio,
  ): MetricRow = {
    val edges = Datasets.test(category, nEdges)
    val m = BenchConfig.mFor(edges.length, sampleRatio)
    val (stream, truth) = buildStream(edges, scenario, pattern, streamSeed(category))
    val cells = algs.map { alg =>
      val policy =
        if (alg == "WSD-L") PolicyStore.trained(category, scenario, pattern, agg).policy else null
      val rs = ParallelTrials.run(spark, BenchConfig.trials) { i =>
        val counter = Algorithms.make(alg, pattern, m, seed = 1_000_003L * (i + 1) + alg.hashCode, policy, agg)
        TrialRunner.run(stream, counter, truth)
      }
      val n = rs.size.toDouble
      alg -> Cell(rs.map(_.are).sum / n, rs.map(_.mare).sum / n, rs.map(_.seconds).sum / n)
    }
    MetricRow(Datasets.testName(category), stream.length, cells)
  }

  /** A full metric table (Tables II, III, VII, VIII, IX, X). */
  def metricTable(
      spark: SparkSession,
      pattern: Pattern,
      scenario: Scenario,
      categories: Seq[String],
      nEdges: Int,
      algs: Seq[String] = Algorithms.fullyDynamic,
      sampleRatio: Double = BenchConfig.sampleRatio,
  ): Seq[MetricRow] =
    categories.map(c =>
      evaluateDataset(spark, c, pattern, scenario, nEdges, algs, sampleRatio = sampleRatio))

  /** Render a metric table in the paper's three-section layout. */
  def renderMetricTable(title: String, rows: Seq[MetricRow]): String = {
    val algs = rows.head.cells.map(_._1)
    val sb = new StringBuilder
    sb ++= s"== $title ==\n"
    def section(label: String, f: Cell => Double, fmt: Double => String): Unit = {
      sb ++= s"-- $label --\n"
      sb ++= ("%-12s".format("Graph") + algs.map(a => "%10s".format(a)).mkString) + "\n"
      rows.foreach { r =>
        sb ++= "%-12s".format(r.dataset)
        r.cells.foreach { case (_, c) => sb ++= "%10s".format(fmt(f(c))) }
        sb ++= "\n"
      }
    }
    section("Absolute Relative Error (%)", _.are * 100, d => f"$d%.3f")
    section("Mean Absolute Relative Error (%)", _.mare * 100, d => f"$d%.3f")
    section("Running Time (s)", _.seconds, d => f"$d%.3f")
    sb.result()
  }

  /** Persist a table as TSV under bench-results/ (absolute, fork-safe). */
  def writeTsv(name: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val dir = Paths.get(sys.props.getOrElse("repro.results.dir", "/root/repo/bench-results"))
    Files.createDirectories(dir)
    val content = (header +: rows).map(_.mkString("\t")).mkString("", "\n", "\n")
    Files.write(dir.resolve(s"$name.tsv"), content.getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }

  /** TSV dump of a metric table. */
  def writeMetricTsv(name: String, rows: Seq[MetricRow]): Unit = {
    val algs = rows.head.cells.map(_._1)
    val header = "graph" +: algs.flatMap(a => Seq(s"$a.are%", s"$a.mare%", s"$a.time_s"))
    writeTsv(name, header, rows.map { r =>
      r.dataset +: r.cells.flatMap { case (_, c) =>
        Seq(f"${c.are * 100}%.4f", f"${c.mare * 100}%.4f", f"${c.seconds}%.4f")
      }
    })
  }

  /** Transferability table (Tables V and XII): rows = test graphs, columns =
    * training sources + WSD-H; ARE of triangle counting.
    */
  def transferTable(spark: SparkSession, scenario: Scenario, nEdges: Int): Seq[(String, Seq[(String, Double)])] = {
    val sources = Datasets.categories
    val tests = Seq("cit", "com", "soc", "web")
    tests.map { testCat =>
      val edges = Datasets.test(testCat, nEdges)
      val m = BenchConfig.mFor(edges.length)
      val (stream, truth) = buildStream(edges, scenario, Triangle, streamSeed(testCat))
      val cols = sources.map { src =>
        val policy = PolicyStore.trained(src, scenario, Triangle).policy
        val rs = ParallelTrials.run(spark, BenchConfig.trials) { i =>
          TrialRunner.run(stream, Algorithms.make("WSD-L", Triangle, m, 7L * (i + 1) + src.hashCode, policy), truth)
        }
        Datasets.trainName(src) -> rs.map(_.are).sum / rs.size
      } :+ {
        val rs = ParallelTrials.run(spark, BenchConfig.trials) { i =>
          TrialRunner.run(stream, Algorithms.make("WSD-H", Triangle, m, 13L * (i + 1)), truth)
        }
        "WSD-H" -> rs.map(_.are).sum / rs.size
      }
      Datasets.testName(testCat) -> cols
    }
  }

  /** Ablation (Table XIII): WSD-L(Max) vs WSD-L(Avg) vs WSD-H; triangle ARE. */
  def ablationTable(spark: SparkSession, scenario: Scenario, nEdges: Int): Seq[(String, Seq[(String, Double)])] = {
    val tests = Seq("cit", "com", "soc", "web")
    tests.map { cat =>
      val edges = Datasets.test(cat, nEdges)
      val m = BenchConfig.mFor(edges.length)
      val (stream, truth) = buildStream(edges, scenario, Triangle, streamSeed(cat))
      def are(alg: String, agg: TemporalAgg): Double = {
        val policy =
          if (alg == "WSD-L") PolicyStore.trained(cat, scenario, Triangle, agg).policy else null
        val rs = ParallelTrials.run(spark, BenchConfig.trials) { i =>
          TrialRunner.run(stream, Algorithms.make(alg, Triangle, m, 17L * (i + 1) + agg.label.hashCode, policy, agg), truth)
        }
        rs.map(_.are).sum / rs.size
      }
      Datasets.testName(cat) -> Seq(
        "WSD-L (Max)" -> are("WSD-L", TemporalAgg.Max),
        "WSD-L (Avg)" -> are("WSD-L", TemporalAgg.Avg),
        "WSD-H" -> are("WSD-H", TemporalAgg.Max),
      )
    }
  }

  /** Render a single-metric (ARE) table with arbitrary columns. */
  def renderAreTable(title: String, rows: Seq[(String, Seq[(String, Double)])]): String = {
    val cols = rows.head._2.map(_._1)
    val sb = new StringBuilder
    sb ++= s"== $title ==\n"
    sb ++= ("%-12s".format("Graph") + cols.map(c => "%12s".format(c)).mkString) + "\n"
    rows.foreach { case (ds, cells) =>
      sb ++= "%-12s".format(ds)
      cells.foreach { case (_, v) => sb ++= "%12s".format(f"${v * 100}%.3f") }
      sb ++= "\n"
    }
    sb.result()
  }
}
