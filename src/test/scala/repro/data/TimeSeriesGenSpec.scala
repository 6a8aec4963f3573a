package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.SpeedConstraint

class TimeSeriesGenSpec extends AnyFunSuite {

  test("stock: univariate, requested length, deterministic in the seed") {
    val a = TimeSeriesGen.stock(1000, seed = 1)
    val b = TimeSeriesGen.stock(1000, seed = 1)
    val c = TimeSeriesGen.stock(1000, seed = 2)
    assert(a.length == 1000 && a(0).dim == 1)
    assert(a.indices.forall(i => a(i).sameValues(b(i), 0.0)))
    assert(a.indices.exists(i => !a(i).sameValues(c(i), 0.0)))
  }

  test("stock prices stay positive") {
    assert(TimeSeriesGen.stock(5000).forall(_.v(0) >= 10.0))
  }

  test("ild: 3 dimensions with distinct scales") {
    val pts = TimeSeriesGen.ild(5000)
    assert(pts(0).dim == 3)
    val means = (0 until 3).map(l => pts.map(_.v(l)).sum / pts.length)
    assert(means(0) > 15 && means(0) < 30)   // temperature
    assert(means(1) > 30 && means(1) < 60)   // humidity
    assert(means(2) > 100)                   // light
  }

  test("tao: 3 smooth dimensions") {
    val pts = TimeSeriesGen.tao(5000)
    assert(pts(0).dim == 3)
    // smooth: max consecutive speed well under the value range
    val speeds = SpeedConstraint.consecutiveSpeeds(pts)
    assert(speeds.max < 1.0)
  }

  test("ecg: configurable dimensionality") {
    assert(TimeSeriesGen.ecg(500, dims = 32)(0).dim == 32)
    assert(TimeSeriesGen.ecg(500, dims = 4)(0).dim == 4)
  }

  test("gpsWalk: walking speeds in the truth, embedded errors in the dirty copy") {
    val DT = TimeSeriesGen.gpsWalk(4000)
    val speeds = SpeedConstraint.consecutiveSpeeds(DT.truth)
    assert(speeds.max < 2.5, "walking stays below ~2.5 m/s")
    val nDirty = DT.dirty.indices.count(i => !DT.dirty(i).sameValues(DT.truth(i), 0.0))
    assert(nDirty > 0, "errors are embedded")
    assert(nDirty.toDouble / DT.dirty.length < 0.1, "errors are sparse")
  }

  test("gpsWalk: errors come in consecutive runs") {
    val DT = TimeSeriesGen.gpsWalk(6000)
    val dirtyIdx = DT.dirty.indices.filter(i => !DT.dirty(i).sameValues(DT.truth(i), 0.0))
    val runs = dirtyIdx.foldLeft(List.empty[List[Int]]) {
      case (acc, i) if acc.nonEmpty && acc.head.head == i - 1 => (i :: acc.head) :: acc.tail
      case (acc, i) => List(i) :: acc
    }
    assert(runs.exists(_.size >= 3), "at least one run of length >= 3")
  }

  test("gpsMixed: three speed regimes") {
    val DT = TimeSeriesGen.gpsMixed(3000)
    val sp = SpeedConstraint.consecutiveSpeeds(DT.truth)
    val third = sp.length / 3
    val walk = sp.slice(0, third).sum / third
    val cycle = sp.slice(2 * third, sp.length).sum / (sp.length - 2 * third)
    assert(cycle > walk * 2, s"cycling ($cycle) much faster than walking ($walk)")
  }

  test("classification sets have the paper's shapes (Table 2)") {
    val ah = TimeSeriesGen.arrowHead()
    assert(ah.size == 211 && ah.head.points.length == 251 && ah.head.points(0).dim == 1)
    assert(ah.map(_.label).distinct.size == 3)
    val af = TimeSeriesGen.atrialFib()
    assert(af.size == 30 && af.head.points.length == 640 && af.head.points(0).dim == 2)
    val dsr = TimeSeriesGen.dsr()
    assert(dsr.size == 16 && dsr.head.points.length == 345)
    val swj = TimeSeriesGen.swj()
    assert(swj.size == 27 && swj.head.points.length == 2500 && swj.head.points(0).dim == 4)
  }

  test("timestamps are strictly increasing everywhere") {
    for (pts <- Seq(TimeSeriesGen.stock(500), TimeSeriesGen.ild(500),
                    TimeSeriesGen.tao(500), TimeSeriesGen.ecg(500, 4),
                    TimeSeriesGen.gpsWalk(500).dirty))
      assert((1 until pts.length).forall(i => pts(i).t > pts(i - 1).t))
  }
}
