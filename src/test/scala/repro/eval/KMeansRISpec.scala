package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.data.TimeSeriesGen

class KMeansRISpec extends AnyFunSuite {

  test("rand index of identical partitions is 1") {
    assert(KMeansRI.randIndex(Seq(0, 0, 1, 1), Seq(1, 1, 0, 0)) == 1.0)
  }

  test("rand index penalises disagreement") {
    val ri = KMeansRI.randIndex(Seq(0, 0, 1, 1), Seq(0, 1, 0, 1))
    assert(ri < 1.0)
  }

  test("rand index of single-element partitions is 1") {
    assert(KMeansRI.randIndex(Seq(0), Seq(3)) == 1.0)
  }

  test("kmeans separates two well-separated blobs") {
    val feats = (0 until 10).map(i => Array(i * 0.01)) ++
      (0 until 10).map(i => Array(100.0 + i * 0.01))
    val assign = KMeansRI.kmeans(feats, 2, seed = 1)
    assert(assign.take(10).distinct.size == 1)
    assert(assign.drop(10).distinct.size == 1)
    assert(assign.head != assign.last)
  }

  test("kmeans assignment length matches input") {
    val feats = (0 until 7).map(i => Array(i.toDouble))
    assert(KMeansRI.kmeans(feats, 3, seed = 2).size == 7)
  }

  test("clustering clean synthetic UCR-like data scores a high RI") {
    val ri = KMeansRI.evaluate(TimeSeriesGen.dsr(), seed = 4)
    assert(ri > 0.7, s"RI $ri")
  }
}
