package repro.spark

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.baselines.Detector
import repro.eval.Scoring
import repro.synth.Datasets.Series

/** Rows exchanged through the Spark layer. */
final case class SeriesRow(id: Long, cond: String, values: Array[Double], truth: Array[Int])

final case class DetectionRow(id: Long, cond: String, algo: String,
                              detected: Array[Int], truth: Array[Int], millis: Double)

/** Per-series, per-tolerance match counts — the unit the SQL layer
  * aggregates (and the DuckDB oracle re-aggregates).
  */
final case class ScoreRow(id: Long, cond: String, algo: String, tol: Double,
                          tp: Int, fp: Int, fn: Int, topCorrect: Int)

/** Batch detection driver: the algorithm is per-series, so the Spark
  * parallelization (per the repro guidance) is `mapPartitions` over a
  * `Dataset[SeriesRow]` — each partition runs the detectors on its series
  * with no shuffle until evaluation.
  */
object SparkDetect {

  def toDataset(spark: SparkSession, series: Seq[Series]): Dataset[SeriesRow] = {
    import spark.implicits._
    spark.createDataset(series.map(s => SeriesRow(s.id, s.cond, s.values, s.truth)))
      .repartition(math.min(series.size, spark.sparkContext.defaultParallelism))
  }

  /** Run every detector on every series; wall-clock per detection recorded
    * for the Table 7 runtime study.
    */
  def detect(ds: Dataset[SeriesRow], detectors: Seq[Detector]): Dataset[DetectionRow] = {
    import ds.sparkSession.implicits._
    ds.mapPartitions { it =>
      it.flatMap { s =>
        detectors.iterator.map { d =>
          val t0  = System.nanoTime()
          val det = d.detect(s.values)
          val ms  = (System.nanoTime() - t0) / 1e6
          DetectionRow(s.id, s.cond, d.name, det.toArray, s.truth, ms)
        }
      }
    }
  }

  /** Expand detections into per-tolerance score rows. */
  def score(det: Dataset[DetectionRow], tolerances: Seq[Double]): Dataset[ScoreRow] = {
    import det.sparkSession.implicits._
    det.flatMap { r =>
      tolerances.map { tol =>
        val c = Scoring.score(r.detected.toIndexedSeq, r.truth.toIndexedSeq, tol)
        val top = r.truth.headOption.exists(t =>
          Scoring.topOneCorrect(r.detected.toIndexedSeq, t, tol))
        ScoreRow(r.id, r.cond, r.algo, tol, c.tp, c.fp, c.fn, if (top) 1 else 0)
      }
    }
  }
}
