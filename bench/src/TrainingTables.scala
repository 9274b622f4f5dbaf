package repro.bench

import repro.core.{Pattern, Triangle, Wedge}
import repro.graphgen.Scenario
import repro.harness.{PolicyStore, Tables}

/** Tables IV and XI — WSD-L training time per category and pattern.
  * The paper reports hours on million-edge graphs; our scaled training
  * (BenchConfig.trainEdges, trainStreams, gradSteps) reports seconds —
  * the paper/measured pair is recorded in EXPERIMENTS.md.
  */
abstract class TrainingTimeTable(scenario: Scenario, tableId: String, title: String)
    extends BenchTable {

  test(s"$title: training time per category and pattern") {
    val cats = Seq("cit", "com", "soc", "web")
    val patterns: Seq[Pattern] = Seq(Triangle, Wedge)
    val header = "category" +: patterns.map(p => s"${p.name}_s")
    val rows = cats.map { c =>
      c +: patterns.map { p =>
        val t = PolicyStore.trained(c, scenario, p)
        assert(t.seconds > 0 && t.gradSteps > 0, s"$c/${p.name}")
        f"${t.seconds}%.2f"
      }
    }
    println(s"== $title ==")
    (header +: rows).foreach(r => println(r.map(x => "%12s".format(x)).mkString))
    Tables.writeTsv(tableId, header, rows)
  }
}

/** Table IV — training time, massive deletion scenario. */
class Table04TrainingTimeMassive
  extends TrainingTimeTable(Scenario.Massive(), "table04_training_massive",
    "Table IV — training time (massive deletion)")

/** Table XI — training time, light deletion scenario. */
class Table11TrainingTimeLight
  extends TrainingTimeTable(Scenario.Light(), "table11_training_light",
    "Table XI — training time (light deletion)")
