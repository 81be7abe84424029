package repro.bench

import org.apache.spark.sql.DataFrame
import repro.SparkSpec

/** Shared plumbing for the per-table bench suites.
  *
  * Each suite regenerates one evaluation table, prints measured rows next
  * to the paper's published numbers (copy into EXPERIMENTS.md), and asserts
  * the paper's qualitative shape — which algorithm wins, roughly by how
  * much — rather than absolute values (our data is synthetic, see
  * DESIGN.md §4).
  *
  * Series counts scale with REPRO_BENCH_COUNT (default 60; paper used 1000).
  */
trait BenchBase extends SparkSpec {

  def benchCount: Int = sys.env.get("REPRO_BENCH_COUNT").map(_.toInt).getOrElse(60)

  /** (cond, algo, tol) → (precision, recall, f1, top1) from an EvalSql
    * metrics DataFrame.
    */
  def metricMap(df: DataFrame): Map[(String, String, Double), (Double, Double, Double, Double)] =
    df.collect().map { r =>
      (r.getString(0), r.getString(1), r.getDouble(2)) ->
        ((r.getDouble(3), r.getDouble(4), r.getDouble(5), r.getDouble(6)))
    }.toMap

  def banner(title: String): Unit =
    println(s"\n=== $title (n=$benchCount/condition unless noted) ===")

  def row(cols: Any*): Unit =
    println(cols.map {
      case d: Double => f"$d%8.3f"
      case s: String => f"$s%-42s"
      case x         => x.toString
    }.mkString(" | "))
}
