package repro.spark

import org.apache.spark.sql.{DataFrame, Dataset}

/** Evaluation aggregation in Spark SQL (Catalyst). The SQL is shared with
  * the DuckDB oracle so every metric table in the benches can be (and in
  * tests is) cross-checked for result equality.
  */
object EvalSql {

  /** Micro-averaged precision / recall / F1 / top-1 accuracy per
    * (cond, algo, tol). Written as plain SQL so the identical text runs on
    * DuckDB over the same score rows.
    */
  val MetricsSql: String =
    """SELECT cond, algo, CAST(tol AS DOUBLE) AS tol,
      |  CASE WHEN SUM(CAST(tp AS BIGINT)) + SUM(CAST(fp AS BIGINT)) = 0 THEN 0.0
      |       ELSE CAST(SUM(CAST(tp AS BIGINT)) AS DOUBLE)
      |            / (SUM(CAST(tp AS BIGINT)) + SUM(CAST(fp AS BIGINT))) END AS precision_,
      |  CASE WHEN SUM(CAST(tp AS BIGINT)) + SUM(CAST(fn AS BIGINT)) = 0 THEN 0.0
      |       ELSE CAST(SUM(CAST(tp AS BIGINT)) AS DOUBLE)
      |            / (SUM(CAST(tp AS BIGINT)) + SUM(CAST(fn AS BIGINT))) END AS recall_,
      |  CASE WHEN 2 * SUM(CAST(tp AS BIGINT)) + SUM(CAST(fp AS BIGINT)) + SUM(CAST(fn AS BIGINT)) = 0 THEN 0.0
      |       ELSE 2.0 * CAST(SUM(CAST(tp AS BIGINT)) AS DOUBLE)
      |            / (2 * SUM(CAST(tp AS BIGINT)) + SUM(CAST(fp AS BIGINT)) + SUM(CAST(fn AS BIGINT))) END AS f1,
      |  CAST(SUM(CAST(topCorrect AS BIGINT)) AS DOUBLE) / COUNT(*) AS top1_acc,
      |  COUNT(*) AS n_series
      |FROM scores
      |GROUP BY cond, algo, tol
      |ORDER BY cond, algo, tol""".stripMargin

  def metrics(scores: Dataset[ScoreRow]): DataFrame = {
    scores.createOrReplaceTempView("scores")
    scores.sparkSession.sql(MetricsSql)
  }

  /** Mean runtime per (cond, algo) in milliseconds — Table 7. */
  val RuntimeSql: String =
    """SELECT cond, algo, AVG(CAST(millis AS DOUBLE)) AS avg_ms, COUNT(*) AS n_series
      |FROM detections
      |GROUP BY cond, algo
      |ORDER BY cond, algo""".stripMargin

  def runtimes(det: Dataset[DetectionRow]): DataFrame = {
    det.createOrReplaceTempView("detections")
    det.sparkSession.sql(RuntimeSql)
  }
}
