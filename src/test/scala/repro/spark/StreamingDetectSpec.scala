package repro.spark

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.streaming.Trigger
import repro.SparkSpec
import repro.eval.Tables
import repro.synth.Datasets

class StreamingDetectSpec extends SparkSpec {

  test("streamed per-point telemetry yields the same detections as batch") {
    import spark.implicits._
    implicit val sql = spark.sqlContext
    val series = Datasets.singlePeriodSin(2, 0.1, 0.01, seed = 55, n = 600)
    val detector = Tables.robust

    val stream = MemoryStream[StreamingDetect.Point]
    val out = StreamingDetect.detections(stream.toDS(), detector)
    val query = out.writeStream
      .format("memory")
      .queryName("stream_detections")
      .outputMode("append")
      .trigger(Trigger.ProcessingTime(0))
      .start()
    try {
      // Feed each series in three chunks across micro-batches.
      val points = series.flatMap { s =>
        s.values.zipWithIndex.map { case (v, t) =>
          StreamingDetect.Point(s.id, s.cond, t.toLong, v, s.values.length)
        }
      }
      val chunks = points.grouped(points.size / 3 + 1).toSeq
      chunks.foreach { c => stream.addData(c); query.processAllAvailable() }

      val got = spark.sql("SELECT * FROM stream_detections").as[DetectionRow]
        .collect().sortBy(_.id)
      assert(got.length == series.size, s"got ${got.length} detections")
      got.zip(series.sortBy(_.id)).foreach { case (d, s) =>
        assert(d.detected.toSeq == detector.detect(s.values), s"series ${s.id}")
      }
    } finally query.stop()
  }

  test("incomplete series emit nothing (state held, no spurious output)") {
    import spark.implicits._
    implicit val sql = spark.sqlContext
    val series = Datasets.singlePeriodSin(1, 0.1, 0.01, seed = 56, n = 400).head
    val stream = MemoryStream[StreamingDetect.Point]
    val out = StreamingDetect.detections(stream.toDS(), Tables.robust)
    val query = out.writeStream.format("memory").queryName("stream_partial")
      .outputMode("append").start()
    try {
      val half = series.values.take(200).zipWithIndex.map { case (v, t) =>
        StreamingDetect.Point(series.id, series.cond, t.toLong, v, 400)
      }
      stream.addData(half.toSeq)
      query.processAllAvailable()
      assert(spark.sql("SELECT * FROM stream_partial").count() == 0)
    } finally query.stop()
  }
}
