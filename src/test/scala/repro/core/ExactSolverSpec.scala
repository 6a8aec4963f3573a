package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ExactSolverSpec extends AnyFunSuite {

  private def example24: Array[TimePoint] = Array(
    TimePoint(1, Array(1.0, 1.0)), TimePoint(2, Array(1.8, 1.8)),
    TimePoint(3, Array(2.6, 1.0)), TimePoint(4, Array(3.4, 1.0)),
    TimePoint(5, Array(4.5, 1.0)), TimePoint(6, Array(5.5, 1.0)),
    TimePoint(7, Array(6.4, 1.0)))

  test("Example 2.5: solver substitute finds minimum fix = 2") {
    assert(ExactSolver.minFixCount(example24, SpeedConstraint(1.0, 7.0)) == 2)
  }

  test("minFixList on Example 2.4 repairs two points") {
    val fix = ExactSolver.minFixList(example24, SpeedConstraint(1.0, 7.0))
    assert(fix.length == 2)
  }

  test("clean series needs zero fixes") {
    val pts = Array.tabulate(10)(i => TimePoint.uni(i.toDouble, i * 0.5))
    assert(ExactSolver.minFixCount(pts, SpeedConstraint(1.0, 5.0)) == 0)
  }

  test("single outlier needs one fix") {
    val pts = Array.tabulate(10)(i => TimePoint.uni(i.toDouble, if (i == 5) 99.0 else 0.0))
    assert(ExactSolver.minFixCount(pts, SpeedConstraint(1.0, 9.0)) == 1)
  }

  test("empty series") {
    assert(ExactSolver.minFixCount(Array.empty, SpeedConstraint(1, 1)) == 0)
  }

  test("guards against exponential blow-up") {
    val pts = Array.tabulate(30)(i => TimePoint.uni(i.toDouble, 0.0))
    intercept[IllegalArgumentException] {
      ExactSolver.minFixCount(pts, SpeedConstraint(1, 1))
    }
  }

  test("a large jump fails the pure speed test even across a wide gap") {
    // Pure speed semantics (see MtcscG doc): a 100-unit jump over 9 time
    // units violates s = 1 regardless of the window, so one group must go.
    val pts = Array(
      TimePoint.uni(0, 0.0), TimePoint.uni(1, 0.1),
      TimePoint.uni(10, 100.0), TimePoint.uni(11, 100.1))
    assert(ExactSolver.minFixCount(pts, SpeedConstraint(1.0, 2.0)) == 2)
  }
}
