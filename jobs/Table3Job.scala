package repro.jobs

import repro.eval.Experiments

/** Entrypoint reproducing Table 3 (summary of compared methods). */
object Table3Job {
  def main(args: Array[String]): Unit =
    println(Experiments.formatTable3())
}
