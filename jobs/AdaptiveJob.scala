package repro.jobs

import repro.eval.{Experiments, Harness}

/** Entrypoint for the adaptive-speed experiments (Figures 14/15):
  * GPS(Mixed) with walking/running/cycling mode changes.
  */
object AdaptiveJob {
  def main(args: Array[String]): Unit = {
    for ((mode, rows) <- Experiments.adaptiveTransportation())
      println(Harness.formatTable(s"GPS(Mixed), initial speed = $mode", rows))
    val (overB, overTau) = Experiments.adaptiveSensitivity()
    println("sensitivity over bucket number b: " +
      overB.map { case (b, r) => f"b=$b rmse=$r%.4f" }.mkString(", "))
    println("sensitivity over threshold tau: " +
      overTau.map { case (t, r) => f"tau=$t rmse=$r%.4f" }.mkString(", "))
  }
}
