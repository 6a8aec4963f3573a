package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MtcscLSpec extends AnyFunSuite {

  private def example24: Array[TimePoint] = Array(
    TimePoint(1, Array(1.0, 1.0)), TimePoint(2, Array(1.8, 1.8)),
    TimePoint(3, Array(2.6, 1.0)), TimePoint(4, Array(3.4, 1.0)),
    TimePoint(5, Array(4.5, 1.0)), TimePoint(6, Array(5.5, 1.0)),
    TimePoint(7, Array(6.4, 1.0)))

  private val scW2 = SpeedConstraint(1.0, 2.0)

  test("Example 3.3: x2 is repaired to (1.8, 1)") {
    val out = MtcscL(scW2).clean(example24)
    assert(out(1).v.toSeq == Seq(1.8, 1.0))
  }

  test("Example 3.3: x5 is repaired to (4.4, 1)") {
    val out = MtcscL(scW2).clean(example24)
    assert(math.abs(out(4).v(0) - 4.4) < 1e-9)
    assert(out(4).v(1) == 1.0)
  }

  test("Example 3.3: x6 is repaired to (5.4, 1)") {
    val out = MtcscL(scW2).clean(example24)
    assert(math.abs(out(5).v(0) - 5.4) < 1e-9)
    assert(out(5).v(1) == 1.0)
  }

  test("Example 3.3: repair number is 3 (>= global optimum 2)") {
    val out = MtcscL(scW2).clean(example24)
    val changed = example24.indices.count(i => !out(i).sameValues(example24(i), 1e-7))
    assert(changed == 3)
    assert(MtcscG.fixList(example24, SpeedConstraint(1.0, 7.0)).length <= changed)
  }

  test("soundness: every consecutive pair of the repair passes the speed test") {
    val out = MtcscL(scW2).clean(example24)
    for (i <- 1 until out.length) assert(scW2.speedOk(out(i - 1), out(i)), s"pair $i")
  }

  test("clean series passes through unchanged") {
    val clean = Array.tabulate(50)(i => TimePoint(i.toDouble, Array(i * 0.3, math.sin(i * 0.1))))
    val sc = SpeedConstraint(1.0, 5.0)
    val out = MtcscL(sc).clean(clean)
    assert(clean.indices.forall(i => out(i).sameValues(clean(i))))
  }

  test("first point is never modified") {
    val pts = Array(TimePoint.uni(0, 999.0)) ++
      Array.tabulate(5)(i => TimePoint.uni((i + 1).toDouble, 0.0))
    val out = MtcscL(SpeedConstraint(1.0, 3.0)).clean(pts)
    assert(out(0).v(0) == 999.0)
  }

  test("window exhaustion falls back to the previous repaired value") {
    // x1 jumps far away and nothing in the window is compatible with x0.
    val pts = Array(
      TimePoint.uni(0, 0.0), TimePoint.uni(1, 100.0),
      TimePoint.uni(2, 100.0), TimePoint.uni(3, 100.0),
      TimePoint.uni(4, 100.0), TimePoint.uni(5, 100.0))
    val out = MtcscL(SpeedConstraint(1.0, 2.0)).clean(pts)
    assert(out(1).v(0) == 0.0) // falls back to x'_0
  }

  test("end-of-series without compatible successor falls back to previous repair") {
    val pts = Array(TimePoint.uni(0, 0.0), TimePoint.uni(1, 50.0))
    val out = MtcscL(SpeedConstraint(1.0, 10.0)).clean(pts)
    assert(out(1).v(0) == 0.0)
  }

  test("interpolation places the repair on the p-m line (Proposition 3.2)") {
    val pts = Array(
      TimePoint(0, Array(0.0, 0.0)), TimePoint(1, Array(9.0, 9.0)),
      TimePoint(2, Array(2.0, 0.0)))
    val out = MtcscL(SpeedConstraint(1.5, 5.0)).clean(pts)
    assert(out(1).v.toSeq == Seq(1.0, 0.0)) // alpha = 1/2 toward (2,0)
    assert(SpeedConstraint(1.5, 5.0).speedOk(out(0), out(1)))
  }

  test("consecutive error run is walked through via previous repairs") {
    val base = Array.tabulate(30)(i => TimePoint.uni(i.toDouble, i * 0.2))
    val dirty = TimePoint.copyOf(base)
    for (i <- 10 until 15) dirty(i).v(0) = 50.0
    val sc = SpeedConstraint(0.5, 4.0)
    val out = MtcscL(sc).clean(dirty)
    for (i <- 1 until out.length) assert(sc.speedOk(out(i - 1), out(i)), s"pair $i")
    // points after the run recover to the true trend
    assert(math.abs(out(20).v(0) - base(20).v(0)) < 1e-6)
  }

  test("repair count of local is at least the global optimum on random data") {
    val rnd = new java.util.Random(5)
    for (_ <- 0 until 10) {
      val n = 30
      val pts = Array.tabulate(n)(i => TimePoint.uni(i.toDouble,
        if (rnd.nextDouble() < 0.2) rnd.nextDouble() * 20 else i * 0.1))
      val sc = SpeedConstraint(0.5, 4.0)
      val local = MtcscL(sc).clean(pts)
      val localFix = pts.indices.count(i => !local(i).sameValues(pts(i), 1e-7))
      val globalFix = MtcscG.fixList(pts, sc).length
      assert(globalFix <= localFix)
    }
  }
}
