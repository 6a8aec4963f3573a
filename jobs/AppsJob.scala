package repro.jobs

import repro.eval.Experiments

/** Entrypoint for the data-mining applications experiment (Figure 16):
  * KNN classification (F1) and K-means clustering (RI) over clean,
  * dirty and repaired training data.
  */
object AppsJob {
  def main(args: Array[String]): Unit = {
    val rows = Experiments.applications()
    println(f"${"dataset"}%-10s ${"variant"}%-9s ${"F1"}%7s ${"RI"}%7s")
    rows.foreach(r => println(f"${r.dataset}%-10s ${r.variant}%-9s ${r.f1}%7.4f ${r.ri}%7.4f"))
  }
}
