package repro.spark

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.streaming.StreamingQuery
import repro.SparkSpec
import repro.TestUtil
import repro.core.{EdgeEvent, HeuristicWeight, Triangle, WSD, Wedge}
import repro.spark.StreamingWSD.{Est, Ev}

class StreamingWSDSpec extends SparkSpec {

  override def afterAll(): Unit = {
    // restore the shared session's shuffle parallelism for later suites
    spark.conf.set("spark.sql.shuffle.partitions",
      sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
    super.afterAll()
  }

  private def toEvs(events: Array[EdgeEvent]): Array[Ev] =
    events.zipWithIndex.map { case (e, i) => Ev(i.toLong, e.insert, e.u, e.v) }

  /** Sequential reference: estimate after every event. */
  private def reference(events: Array[EdgeEvent], pattern: repro.core.Pattern,
                        m: Int, seed: Long): Array[Est] = {
    val w = new WSD(pattern, m, HeuristicWeight, seed)
    events.zipWithIndex.map { case (e, i) =>
      w.process(e); Est(i.toLong, w.estimate, w.sampleSize)
    }
  }

  private def runStreaming(events: Array[EdgeEvent], batches: Seq[Range],
                           pattern: repro.core.Pattern, m: Int, seed: Long,
                           queryName: String): Array[Est] = {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    // single keyed group — 64 state-store partitions per micro-batch would
    // only add commit latency (the per-event-split test runs 40 batches)
    spark.conf.set("spark.sql.shuffle.partitions", "2")
    val input = MemoryStream[Ev]
    val est = StreamingWSD.estimates(input.toDS(), pattern, m, HeuristicWeight, seed)
    val query: StreamingQuery = est.writeStream
      .format("memory").queryName(queryName).outputMode("append").start()
    try {
      val evs = toEvs(events)
      batches.foreach { r => input.addData(r.map(evs(_))); query.processAllAvailable() }
      spark.table(queryName).as[Est].collect().sortBy(_.seq)
    } finally query.stop()
  }

  test("single-batch streaming equals the sequential sampler exactly") {
    val events = TestUtil.randomEvents(nVertices = 20, steps = 300, seed = 1, deleteBias = 0.3)
    val got = runStreaming(events, Seq(events.indices), Triangle, m = 40, seed = 9, "wsd_one")
    val want = reference(events, Triangle, m = 40, seed = 9)
    assert(got.length == want.length)
    got.zip(want).foreach { case (g, w) => assert(g == w, s"seq ${g.seq}") }
  }

  test("multi-batch streaming equals the sequential sampler exactly") {
    val events = TestUtil.randomEvents(nVertices = 20, steps = 400, seed = 2, deleteBias = 0.3)
    val batches = Seq(0 until 100, 100 until 150, 150 until 400)
    val got = runStreaming(events, batches, Triangle, m = 30, seed = 10, "wsd_multi")
    val want = reference(events, Triangle, m = 30, seed = 10)
    assert(got.toSeq == want.toSeq)
  }

  test("per-event batches (worst-case split) still match") {
    val events = TestUtil.randomEvents(nVertices = 12, steps = 40, seed = 3, deleteBias = 0.3)
    val batches = events.indices.map(i => i until (i + 1))
    val got = runStreaming(events, batches, Triangle, m = 20, seed = 11, "wsd_tiny")
    val want = reference(events, Triangle, m = 20, seed = 11)
    assert(got.toSeq == want.toSeq)
  }

  test("wedge pattern streams too, with bounded state") {
    val events = TestUtil.randomEvents(nVertices = 25, steps = 500, seed = 4, deleteBias = 0.3)
    val got = runStreaming(events, Seq(0 until 250, 250 until 500), Wedge, m = 25, seed = 12, "wsd_wedge")
    val want = reference(events, Wedge, m = 25, seed = 12)
    assert(got.toSeq == want.toSeq)
    assert(got.forall(_.sampleSize <= 25))
  }
}
