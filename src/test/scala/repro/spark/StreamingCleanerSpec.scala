package repro.spark

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.SparkSpec
import repro.core._
import repro.data.TimeSeriesGen

class StreamingCleanerSpec extends SparkSpec {

  private val sc2 = SpeedConstraint(1.0, 2.0)

  private def example24: Array[TimePoint] = Array(
    TimePoint(1, Array(1.0, 1.0)), TimePoint(2, Array(1.8, 1.8)),
    TimePoint(3, Array(2.6, 1.0)), TimePoint(4, Array(3.4, 1.0)),
    TimePoint(5, Array(4.5, 1.0)), TimePoint(6, Array(5.5, 1.0)),
    TimePoint(7, Array(6.4, 1.0)))

  // ----------------------------------------------- pure advance() logic

  test("advance replays batch MTCSC-L exactly at end of stream") {
    val (emitted, _, pending) =
      StreamingCleaner.advance(sc2, None, example24.toVector, endOfStream = true)
    assert(pending.isEmpty)
    val batch = MtcscL(sc2).clean(example24)
    assert(emitted.length == batch.length)
    emitted.indices.foreach(i => assert(emitted(i).sameValues(batch(i), 1e-9), s"point $i"))
  }

  test("advance incremental = advance whole, for any chunking") {
    val series = TimeSeriesGen.gpsWalk(200, seed = 9).dirty
    val sc = SpeedConstraint(2.5, 8.0)
    val whole = StreamingCleaner.advance(sc, None, series.toVector, endOfStream = true)._1
    for (chunk <- Seq(1, 3, 7, 50)) {
      var prev: Option[TimePoint] = None
      var pending = Vector.empty[TimePoint]
      val emitted = Vector.newBuilder[TimePoint]
      series.grouped(chunk).foreach { batch =>
        val (e, p, rest) = StreamingCleaner.advance(sc, prev, pending ++ batch, endOfStream = false)
        emitted ++= e; prev = p; pending = rest
      }
      val (e, _, rest) = StreamingCleaner.advance(sc, prev, pending, endOfStream = true)
      emitted ++= e
      assert(rest.isEmpty, s"chunk=$chunk")
      val all = emitted.result()
      assert(all.length == whole.length, s"chunk=$chunk")
      all.indices.foreach(i => assert(all(i).sameValues(whole(i), 1e-9), s"chunk=$chunk point $i"))
    }
  }

  test("advance waits when the window has not closed") {
    // Violating point with no successor yet: nothing can be decided.
    val pts = Vector(TimePoint.uni(0, 0.0), TimePoint.uni(1, 50.0))
    val (emitted, prev, pending) = StreamingCleaner.advance(sc2, None, pts, endOfStream = false)
    assert(emitted.length == 1) // only the anchor point
    assert(prev.get.v(0) == 0.0)
    assert(pending.length == 1)
  }

  test("advance emits once a beyond-window successor arrives") {
    val pts = Vector(
      TimePoint.uni(0, 0.0), TimePoint.uni(1, 50.0),
      TimePoint.uni(2, 50.0), TimePoint.uni(3, 50.0),
      TimePoint.uni(4, 50.0)) // t=4 > t=1 + w=2 -> head decidable
    val (emitted, _, _) = StreamingCleaner.advance(sc2, None, pts, endOfStream = false)
    assert(emitted.length >= 2)
    assert(emitted(1).v(0) == 0.0) // fallback to previous repair
  }

  // ------------------------------------------- full Structured Streaming

  test("Structured Streaming micro-batches reproduce batch MTCSC-L") {
    import spark.implicits._
    implicit val sqlCtx = spark.sqlContext
    val series = TimeSeriesGen.gpsWalk(300, seed = 11).dirty
    val sc = SpeedConstraint(2.5, 8.0)
    val input = MemoryStream[SeriesRow]
    val query = StreamingCleaner.clean(input.toDS(), sc)
      .writeStream.format("memory").queryName("mtcsc_stream").outputMode("append").start()
    try {
      val rows = SeriesRow.fromPoints(0L, series)
      rows.grouped(37).foreach { batch => input.addData(batch); query.processAllAvailable() }
      // close the stream with a far-future sentinel so every point is decided
      val sentinel = SeriesRow(0L, series.last.t + 1000, series.last.v.toSeq)
      input.addData(Seq(sentinel)); query.processAllAvailable()
      val got = spark.table("mtcsc_stream").as[SeriesRow].collect()
        .filter(_.t <= series.last.t).sortBy(_.t)
      val batchOut = MtcscL(sc).clean(series)
      assert(got.length == batchOut.length)
      got.indices.foreach { i =>
        val g = got(i)
        assert(g.t == batchOut(i).t)
        g.dims.zip(batchOut(i).v).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
      }
    } finally query.stop()
  }

  test("streaming state keeps separate series independent") {
    import spark.implicits._
    implicit val sqlCtx = spark.sqlContext
    val a = TimeSeriesGen.stock(80, seed = 1)
    val b = TimeSeriesGen.stock(80, seed = 2)
    val sc = SpeedConstraint(2.0, 5.0)
    val input = MemoryStream[SeriesRow]
    val query = StreamingCleaner.clean(input.toDS(), sc)
      .writeStream.format("memory").queryName("mtcsc_multi").outputMode("append").start()
    try {
      val rows = SeriesRow.fromPoints(0L, a) ++ SeriesRow.fromPoints(1L, b)
      input.addData(rows)
      input.addData(Seq(SeriesRow(0L, 1e9, a.last.v.toSeq), SeriesRow(1L, 1e9, b.last.v.toSeq)))
      query.processAllAvailable()
      val got = spark.table("mtcsc_multi").as[SeriesRow].collect().filter(_.t < 1e9)
      assert(got.count(_.seriesId == 0L) == 80)
      assert(got.count(_.seriesId == 1L) == 80)
    } finally query.stop()
  }
}
