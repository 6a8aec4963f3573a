package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.core.TimePoint

class MetricsSpec extends AnyFunSuite {
  private val a = Array(TimePoint(0, Array(0.0, 0.0)), TimePoint(1, Array(1.0, 1.0)))
  private val b = Array(TimePoint(0, Array(3.0, 4.0)), TimePoint(1, Array(1.0, 1.0)))

  test("rmse of identical series is zero") {
    assert(Metrics.rmse(a, a) == 0.0)
  }

  test("rmse averages squared Euclidean distances") {
    // distances 5 and 0 -> sqrt((25+0)/2)
    assert(math.abs(Metrics.rmse(a, b) - math.sqrt(12.5)) < 1e-12)
  }

  test("repairDistance is the mean Euclidean displacement") {
    assert(math.abs(Metrics.repairDistance(a, b) - 2.5) < 1e-12)
  }

  test("repairCount counts changed points") {
    assert(Metrics.repairCount(a, b) == 1)
    assert(Metrics.repairCount(a, a) == 0)
  }

  test("repairFraction normalises by length") {
    assert(Metrics.repairFraction(a, b) == 0.5)
  }

  test("length mismatch is rejected") {
    intercept[IllegalArgumentException](Metrics.rmse(a, a.take(1)))
    intercept[IllegalArgumentException](Metrics.repairDistance(a, a.take(1)))
    intercept[IllegalArgumentException](Metrics.repairCount(a, a.take(1)))
  }

  test("empty series metrics are zero") {
    assert(Metrics.rmse(Array.empty, Array.empty) == 0.0)
    assert(Metrics.repairDistance(Array.empty, Array.empty) == 0.0)
    assert(Metrics.repairFraction(Array.empty, Array.empty) == 0.0)
  }

  test("timed returns the thunk result") {
    val (x, ms) = Metrics.timed { 6 * 7 }
    assert(x == 42 && ms >= 0)
  }
}
