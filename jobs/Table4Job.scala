package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.{Experiments, Harness}

/** spark-submit entrypoint reproducing Table 4: GPS(Walk) with embedded
  * consecutive errors — RMSE / repair distance / repair number for every
  * method, executed through the distributed Spark path.
  *
  * Usage: spark-submit --class repro.jobs.Table4Job repro.jar [n]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(11000)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("mtcsc-table4").getOrCreate()
    try {
      val rows = Experiments.table4(spark, n)
      println(Harness.formatTable("Table 4: GPS(Walk), embedded errors", rows))
    } finally spark.stop()
  }
}
