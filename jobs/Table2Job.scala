package repro.jobs

import repro.eval.Experiments

/** spark-submit entrypoint reproducing Table 2 (dataset summary).
  * Usage: spark-submit --class repro.jobs.Table2Job repro.jar [--small]
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val full = !args.contains("--small")
    println(Experiments.formatTable2(Experiments.table2(full)))
  }
}
