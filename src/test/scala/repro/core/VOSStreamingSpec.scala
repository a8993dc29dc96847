package repro.core

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.{SparkSpec, TestStreams}
import repro.stream.EdgeEvent

class VOSStreamingSpec extends SparkSpec {

  private val H = VOSHashes(k = 32, m = 2048, seed = 19)

  /** Run both stateful queries over `events` fed in `nBatches` micro-batches
    * and reassemble the sketch.
    */
  private def runStreaming(events: IndexedSeq[EdgeEvent], nBatches: Int, parts: Int): VOSSketch = {
    val s = spark
    import s.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext

    val arraySource   = MemoryStream[EdgeEvent]
    val counterSource = MemoryStream[EdgeEvent]
    val qa = VOSStreaming.arrayUpdates(arraySource.toDS(), H, parts)
      .writeStream.outputMode("update").format("memory").queryName("arr_" + nBatches + "_" + parts).start()
    val qc = VOSStreaming.counterUpdates(counterSource.toDS())
      .writeStream.outputMode("update").format("memory").queryName("cnt_" + nBatches + "_" + parts).start()
    try {
      val chunk = math.max(1, events.length / nBatches)
      events.grouped(chunk).foreach { g =>
        arraySource.addData(g); counterSource.addData(g)
        qa.processAllAvailable(); qc.processAllAvailable()
      }
      VOSStreaming.assemble(
        H, parts,
        spark.table("arr_" + nBatches + "_" + parts).as[VOSStreaming.PartUpdate].collect().toSeq,
        spark.table("cnt_" + nBatches + "_" + parts).as[VOSStreaming.UserUpdate].collect().toSeq,
      )
    } finally { qa.stop(); qc.stop() }
  }

  test("bitsPerPart / partLength cover [0, m) exactly") {
    val m = 100
    for (p <- Seq(1, 3, 7, 16)) {
      val bpp = VOSStreaming.bitsPerPart(m, p)
      val total = (0 until p).map(i => math.max(0, VOSStreaming.partLength(m, p, i))).sum
      assert(total == m, s"parts=$p cover $total bits")
      assert(bpp * p >= m)
    }
  }

  test("bitsPerPart validates partition count") {
    intercept[IllegalArgumentException](VOSStreaming.bitsPerPart(10, 0))
    intercept[IllegalArgumentException](VOSStreaming.bitsPerPart(10, 11))
  }

  test("route sends each edge to the partition owning its position") {
    val s = spark
    import s.implicits._
    val events = TestStreams.random(10, 30, 200, seed = 31)
    val routed = VOSStreaming.route(spark.createDataset(events), H, 8).collect()
    val bpp = VOSStreaming.bitsPerPart(H.m, 8)
    routed.foreach { r =>
      assert(r.part == r.pos / bpp)
      assert(r.pos >= 0 && r.pos < H.m)
    }
    // Multiset of positions matches the hash of each event.
    val expected = events.map(e => H.position(e.user, e.item)).sorted
    assert(routed.map(_.pos).sorted.toSeq == expected)
  }

  test("streaming build equals sequential build (multi-batch)") {
    val events = TestStreams.random(25, 80, 2000, seed = 32)
    val seq = VOSSketch.build(H, events)
    val str = runStreaming(events, nBatches = 7, parts = 8)
    assert(str.array == seq.array)
    assert(str.nU == seq.nU)
    assert(str.beta == seq.beta)
  }

  test("streaming build equals sequential build (single batch, 1 partition)") {
    val events = TestStreams.random(12, 40, 600, seed = 33)
    val seq = VOSSketch.build(H, events)
    val str = runStreaming(events, nBatches = 1, parts = 1)
    assert(str.array == seq.array && str.nU == seq.nU)
  }

  test("streaming handles deletions: churn cancels across batches") {
    val events = TestStreams.withChurn(2L, items = 0L until 15L, churn = 30L until 60L)
    val str = runStreaming(events, nBatches = 5, parts = 4)
    val direct = new VOSSketch(H)
    (0L until 15L).foreach(i => direct.update(2L, i, insert = true))
    assert(str.array == direct.array)
    assert(str.cardinality(2L) == 15L)
  }

  test("pair estimates from the streaming sketch match sequential") {
    val events = TestStreams.random(8, 40, 1200, seed = 34)
    val seq = VOSSketch.build(H, events)
    val str = runStreaming(events, nBatches = 4, parts = 6)
    for (u <- 0L until 8L; v <- 0L until u)
      assert(str.estimatePair(u, v) == seq.estimatePair(u, v))
  }

  test("batch-mode execution of the same operators also matches") {
    val s = spark
    import s.implicits._
    val events = TestStreams.random(15, 50, 800, seed = 35)
    val seq = VOSSketch.build(H, events)
    val partUps = VOSStreaming.arrayUpdates(spark.createDataset(events), H, 8).collect().toSeq
    val userUps = VOSStreaming.counterUpdates(spark.createDataset(events)).collect().toSeq
    val got = VOSStreaming.assemble(H, 8, partUps, userUps)
    assert(got.array == seq.array && got.nU == seq.nU)
  }
}
