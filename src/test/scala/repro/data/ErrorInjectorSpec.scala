package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.TimePoint

class ErrorInjectorSpec extends AnyFunSuite {
  private def truth(n: Int = 1000, d: Int = 3): Array[TimePoint] =
    Array.tabulate(n)(i => TimePoint(i.toDouble, Array.tabulate(d)(l => i * 0.1 + l * 100)))

  test("together pattern corrupts all dimensions of the selected points") {
    val t = truth()
    val dirty = ErrorInjector.inject(t, 0.1, ErrorInjector.Together, seed = 1)
    val corrupted = t.indices.filter(i => !dirty(i).sameValues(t(i), 0.0))
    assert(math.abs(corrupted.size - 100) <= 1)
    for (i <- corrupted; l <- 0 until 3)
      assert(dirty(i).v(l) != t(i).v(l), s"dim $l of point $i should be corrupted")
  }

  test("separate pattern corrupts exactly one dimension per selected point") {
    val t = truth()
    val dirty = ErrorInjector.inject(t, 0.1, ErrorInjector.Separate, seed = 2)
    val corrupted = t.indices.filter(i => !dirty(i).sameValues(t(i), 0.0))
    assert(math.abs(corrupted.size - 100) <= 1)
    for (i <- corrupted) {
      val dims = (0 until 3).count(l => dirty(i).v(l) != t(i).v(l))
      assert(dims == 1, s"point $i corrupted in $dims dims")
    }
  }

  test("replacement values stay within [min, max] of the dimension") {
    val t = truth()
    val dirty = ErrorInjector.inject(t, 0.2, ErrorInjector.Together, seed = 3)
    for (l <- 0 until 3) {
      val lo = t.map(_.v(l)).min
      val hi = t.map(_.v(l)).max
      assert(dirty.forall(p => p.v(l) >= lo && p.v(l) <= hi))
    }
  }

  test("injection is deterministic in the seed") {
    val t = truth()
    val a = ErrorInjector.inject(t, 0.1, ErrorInjector.Together, seed = 5)
    val b = ErrorInjector.inject(t, 0.1, ErrorInjector.Together, seed = 5)
    assert(a.indices.forall(i => a(i).sameValues(b(i), 0.0)))
  }

  test("different seeds give different corruptions") {
    val t = truth()
    val a = ErrorInjector.inject(t, 0.1, ErrorInjector.Together, seed = 5)
    val b = ErrorInjector.inject(t, 0.1, ErrorInjector.Together, seed = 6)
    assert(a.indices.exists(i => !a(i).sameValues(b(i), 0.0)))
  }

  test("rate zero is the identity") {
    val t = truth()
    val dirty = ErrorInjector.inject(t, 0.0, ErrorInjector.Separate, seed = 1)
    assert(t.indices.forall(i => dirty(i).sameValues(t(i), 0.0)))
  }

  test("the first point is never corrupted") {
    val t = truth(50)
    for (seed <- 0 until 20) {
      val dirty = ErrorInjector.inject(t, 0.5, ErrorInjector.Together, seed)
      assert(dirty(0).sameValues(t(0), 0.0))
    }
  }

  test("the input series is not mutated") {
    val t = truth()
    val snapshot = TimePoint.copyOf(t)
    ErrorInjector.inject(t, 0.3, ErrorInjector.Together, seed = 9)
    assert(t.indices.forall(i => t(i).sameValues(snapshot(i), 0.0)))
  }
}
