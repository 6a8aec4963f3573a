package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.data.TimeSeriesGen

class KnnSpec extends AnyFunSuite {

  test("macroF1 of perfect predictions is 1") {
    assert(Knn.macroF1(Seq(0, 1, 2, 0), Seq(0, 1, 2, 0)) == 1.0)
  }

  test("macroF1 of all-wrong predictions is 0") {
    assert(Knn.macroF1(Seq(0, 0, 1, 1), Seq(1, 1, 0, 0)) == 0.0)
  }

  test("macroF1 is between 0 and 1") {
    val f1 = Knn.macroF1(Seq(0, 1, 2, 0, 1), Seq(0, 1, 1, 0, 2))
    assert(f1 > 0 && f1 < 1)
  }

  test("1-NN predicts the nearest neighbour's label") {
    val train = Seq((Array(0.0), 0), (Array(10.0), 1))
    assert(Knn.predict(train, Seq(Array(1.0)), 1) == Seq(0))
    assert(Knn.predict(train, Seq(Array(9.0)), 1) == Seq(1))
  }

  test("3-NN majority vote") {
    val train = Seq((Array(0.0), 0), (Array(0.5), 0), (Array(1.0), 1))
    assert(Knn.predict(train, Seq(Array(0.4)), 3) == Seq(0))
  }

  test("classification on clean synthetic UCR-like data is accurate") {
    val all = TimeSeriesGen.arrowHead()
    val (train, test) = all.splitAt(all.size / 2)
    val f1 = Knn.evaluate(train, test)
    assert(f1 > 0.9, s"clean-data F1 $f1 should be high")
  }

  test("features flattens dims in time order") {
    val s = Array(
      repro.core.TimePoint(0, Array(1.0, 2.0)),
      repro.core.TimePoint(1, Array(3.0, 4.0)))
    assert(Knn.features(s).toSeq == Seq(1.0, 2.0, 3.0, 4.0))
  }

  test("euclid handles unequal lengths by truncation") {
    assert(Knn.euclid(Array(0.0, 0.0, 9.9), Array(3.0, 4.0)) == 5.0)
  }
}
