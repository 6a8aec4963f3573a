package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

/** Smoke tests for the light spark-submit entrypoints (the heavy ones —
  * Table4Job, SweepJob, AdaptiveJob, AppsJob — are exercised through the
  * bench suites, which share their implementation in Experiments).
  */
class JobsSpec extends AnyFunSuite {

  test("Table2Job --small prints the dataset table") {
    val out = new java.io.ByteArrayOutputStream()
    Console.withOut(out)(Table2Job.main(Array("--small")))
    val s = out.toString
    assert(s.contains("Stock") && s.contains("GPS(Walk)") && s.contains("SWJ"))
  }

  test("Table3Job prints the method table") {
    val out = new java.io.ByteArrayOutputStream()
    Console.withOut(out)(Table3Job.main(Array.empty))
    val s = out.toString
    assert(s.contains("MTCSC-G") && s.contains("HoloClean") && s.contains("CAE-M"))
  }
}
