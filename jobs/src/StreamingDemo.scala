package repro.jobs

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.core.{HeuristicWeight, Triangle}
import repro.exact.ExactDynamicCounter
import repro.graphgen.{Datasets, Scenario}
import repro.harness.BenchConfig
import repro.spark.StreamingWSD
import repro.spark.StreamingWSD.Ev

/** End-to-end Structured Streaming demo: feeds a fully dynamic edge stream
  * through the WSD operator micro-batch by micro-batch and prints the
  * running estimate against the exact count.
  */
object StreamingDemo {
  def main(args: Array[String]): Unit = JobRunner.withSpark("wsd_streaming") { spark =>
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext

    val edges = Datasets.test("synthetic", args.headOption.map(_.toInt).getOrElse(20000))
    val stream = Scenario.Light().build(edges, seed = 7)
    val m = BenchConfig.mFor(edges.length)

    val input = MemoryStream[Ev]
    val query = StreamingWSD.estimates(input.toDS(), Triangle, m, HeuristicWeight, seed = 1)
      .writeStream.format("memory").queryName("wsd_est").outputMode("append").start()

    val exact = new ExactDynamicCounter(Triangle)
    val batchSize = 1000
    stream.grouped(batchSize).zipWithIndex.foreach { case (batch, b) =>
      val base = b * batchSize
      input.addData(batch.zipWithIndex.map { case (e, i) =>
        Ev((base + i).toLong, e.insert, e.u, e.v)
      })
      query.processAllAvailable()
      batch.foreach(exact.process)
      val est = spark.table("wsd_est").as[StreamingWSD.Est]
        .collect().maxBy(_.seq)
      val err = if (exact.count == 0) 0.0
                else math.abs(est.estimate - exact.count) / exact.count * 100
      println(f"batch=$b%3d events=${base + batch.length}%6d estimate=${est.estimate}%12.1f " +
        f"exact=${exact.count}%10d err=$err%6.2f%% reservoir=${est.sampleSize}/$m")
    }
    query.stop()
  }
}
