package repro.jobs

import repro.core.Triangle
import repro.graphgen.{Datasets, Scenario}
import repro.harness.{Algorithms, ParallelTrials, TrialRunner}

/** Scale-calibration sweep: how do the algorithms' triangle AREs under
  * massive deletion move with graph size and reservoir ratio? Used to pick
  * the bench scale where the paper's ordering is measurable (DESIGN.md §5).
  */
object Sweep {
  def main(args: Array[String]): Unit = JobRunner.withSpark("sweep") { spark =>
    val algs = Seq("WSD-H", "GPS-A", "Triest", "ThinkD", "WRS")
    val trials = 24
    for {
      cat <- Seq("cit", "synthetic")
      nEdges <- Seq(30000, 60000)
      ratio <- Seq(0.05, 0.15, 0.30)
    } {
      val edges = Datasets.test(cat, nEdges)
      val m = math.max(32, (edges.length * ratio).toInt)
      val stream = Scenario.Massive().build(edges, 1000L + cat.hashCode)
      val truth = TrialRunner.truth(stream, Triangle, 50)
      val cells = algs.map { alg =>
        val rs = ParallelTrials.run(spark, trials) { i =>
          TrialRunner.run(stream, Algorithms.make(alg, Triangle, m, 7919L * (i + 1) + alg.hashCode), truth)
        }
        f"$alg=${rs.map(_.are).sum / rs.size * 100}%9.2f"
      }
      println(f"$cat%-10s |E|=$nEdges%6d M/|E|=$ratio%.2f truthEnd=${truth.finalTruth}%8d  " + cells.mkString(" "))
    }
  }
}
