package repro.bench

import repro.core.{FourClique, Triangle, Wedge}
import repro.graphgen.Datasets

/** Table II — wedges, massive deletion (M, α, β_m per BenchConfig scaling). */
class Table02WedgesMassive extends BenchTable {
  test("Table II: wedge counting under massive deletion") {
    val rows = runMetricTable("table02_wedges_massive",
      "Table II — wedges, massive deletion", Wedge, defaultMassive,
      Datasets.categories, benchEdges)
    // at this scale uniform samplers are competitive under massive deletion
    // (see EXPERIMENTS.md); the robust paper shape here is WSD-L ≤ WSD-H
    assertLearnedBeatsHeuristic(rows)
  }
}

/** Table III — triangles, massive deletion. */
class Table03TrianglesMassive extends BenchTable {
  test("Table III: triangle counting under massive deletion") {
    val rows = runMetricTable("table03_triangles_massive",
      "Table III — triangles, massive deletion", Triangle, defaultMassive,
      Datasets.categories, benchEdges)
    assertWeightedBeatsWorstUniform(rows)
  }
}

/** Table VII — 4-cliques, massive deletion (soc-TW omitted, as in the paper). */
class Table07CliquesMassive extends BenchTable {
  test("Table VII: 4-clique counting under massive deletion") {
    val rows = runMetricTable("table07_cliques_massive",
      "Table VII — 4-cliques, massive deletion", FourClique, defaultMassive,
      Seq("cit", "com", "web", "synthetic"), cliqueEdges,
      sampleRatio = repro.harness.BenchConfig.cliqueSampleRatio)
    assertLearnedBeatsHeuristic(rows)
  }
}

/** Table VIII — wedges, light deletion. */
class Table08WedgesLight extends BenchTable {
  test("Table VIII: wedge counting under light deletion") {
    val rows = runMetricTable("table08_wedges_light",
      "Table VIII — wedges, light deletion", Wedge, defaultLight,
      Datasets.categories, benchEdges)
    assertWeightedBeatsWorstUniform(rows)
  }
}

/** Table IX — triangles, light deletion. */
class Table09TrianglesLight extends BenchTable {
  test("Table IX: triangle counting under light deletion") {
    val rows = runMetricTable("table09_triangles_light",
      "Table IX — triangles, light deletion", Triangle, defaultLight,
      Datasets.categories, benchEdges)
    assertWeightedBeatsWorstUniform(rows)
  }
}

/** Table X — 4-cliques, light deletion. */
class Table10CliquesLight extends BenchTable {
  test("Table X: 4-clique counting under light deletion") {
    val rows = runMetricTable("table10_cliques_light",
      "Table X — 4-cliques, light deletion", FourClique, defaultLight,
      Seq("cit", "com", "web", "synthetic"), cliqueEdges,
      sampleRatio = repro.harness.BenchConfig.cliqueSampleRatio)
    assertWeightedBeatsWorstUniform(rows)
  }
}
