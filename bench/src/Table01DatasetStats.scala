package repro.bench

import repro.graphgen.Datasets
import repro.harness.{BenchConfig, Tables}

/** Table I — dataset statistics: the paper's graphs next to our synthetic
  * proxies (|V|, |E| of the train/test pair actually used by the benches).
  */
class Table01DatasetStats extends BenchTable {

  private val paperEdges = Map(
    "cit" -> ("2.67M", "16.5M"), "com" -> ("1.04M", "2.99M"),
    "soc" -> ("1.59M", "265M"), "web" -> ("2.31M", "5.10M"),
    "synthetic" -> ("—", "—"),
  )

  test("Table I: dataset statistics (paper vs proxies)") {
    val header = Seq("category", "train", "train|V|", "train|E|", "paper train|E|",
      "test", "test|V|", "test|E|", "paper test|E|")
    val rows = Datasets.categories.map { c =>
      val tr = Datasets.train(c, BenchConfig.trainEdges)
      val te = Datasets.test(c, BenchConfig.benchEdges)
      val (trV, trE) = Datasets.stats(tr)
      val (teV, teE) = Datasets.stats(te)
      assert(trE > 0 && teE > 0 && trV > 0 && teV > 0)
      Seq(c, Datasets.trainName(c), trV.toString, trE.toString, paperEdges(c)._1,
        Datasets.testName(c), teV.toString, teE.toString, paperEdges(c)._2)
    }
    println("== Table I — dataset statistics ==")
    (header +: rows).foreach(r => println(r.map(x => "%14s".format(x)).mkString))
    Tables.writeTsv("table01_datasets", header, rows)
  }
}
