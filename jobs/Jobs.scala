package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.Tables

/** spark-submit entrypoints, one per evaluation table. Optional first arg:
  * series count per condition (default 100).
  *
  *   spark-submit --class repro.jobs.Table1Job repro.jar [count]
  */
object JobUtil {
  def session(name: String): SparkSession =
    SparkSession.builder.appName(name)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def count(args: Array[String], default: Int = 100): Int =
    args.headOption.map(_.toInt).getOrElse(default)
}

object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("robustperiod-table1")
    println(Tables.render(Tables.table1(spark, JobUtil.count(args)),
      "Table 1: single-period precision (cond | algo | tol | precision | recall | f1 | top1 | n)"))
    spark.stop()
  }
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("robustperiod-table2")
    println(Tables.render(Tables.table2(spark, JobUtil.count(args)),
      "Table 2: multi-period F1 (cond | algo | tol | precision | recall | f1 | top1 | n)"))
    spark.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("robustperiod-table3")
    println(Tables.render(Tables.table3(spark, JobUtil.count(args)),
      "Table 3: square/triangle F1 (cond | algo | tol | precision | recall | f1 | top1 | n)"))
    spark.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("robustperiod-table4")
    println("\n=== Table 4: Alibaba-like datasets ===")
    Tables.table4(spark).foreach { case (cond, algo, det) =>
      println(f"$cond%-38s $algo%-16s -> ${det.mkString("(", ",", ")")}")
    }
    spark.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("robustperiod-table5")
    println(Tables.render(Tables.table5(spark, JobUtil.count(args)),
      "Table 5: ablations (cond | algo | tol | precision | recall | f1 | top1 | n)"))
    spark.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("robustperiod-table6")
    println(Tables.render(Tables.table6(spark, JobUtil.count(args, 40)),
      "Table 6: forecasting (algo | horizon | rmse | mae | n)"))
    spark.stop()
  }
}

object Table7and8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("robustperiod-table7-8")
    val (rt, f1) = Tables.table7and8(spark, JobUtil.count(args, 50))
    println(Tables.render(rt, "Table 7: runtime (cond | algo | avg_ms | n)"))
    println(Tables.render(f1, "Table 8: F1 vs length (cond | algo | tol | precision | recall | f1 | top1 | n)"))
    spark.stop()
  }
}
