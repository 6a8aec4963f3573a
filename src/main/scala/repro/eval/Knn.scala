package repro.eval

import repro.core.TimePoint
import repro.data.TimeSeriesGen.LabeledSeries

/** KNN classification with grid-searched K and macro-F1 (Section 5.5). */
object Knn {

  /** Flatten a series to one feature vector (dims interleaved by time). */
  def features(s: Array[TimePoint]): Array[Double] = s.flatMap(_.v)

  def euclid(a: Array[Double], b: Array[Double]): Double = {
    var acc = 0.0
    var i = 0
    val n = math.min(a.length, b.length)
    while (i < n) { val d = a(i) - b(i); acc += d * d; i += 1 }
    math.sqrt(acc)
  }

  /** Predict labels of `test` from `train` with a K-NN majority vote. */
  def predict(train: Seq[(Array[Double], Int)], test: Seq[Array[Double]], k: Int): Seq[Int] =
    test.map { f =>
      val near = train.map { case (tf, lbl) => (euclid(f, tf), lbl) }.sortBy(_._1).take(k)
      near.groupBy(_._2).view.mapValues(_.size).toSeq.sortBy { case (lbl, c) => (-c, lbl) }.head._1
    }

  /** Macro-averaged F1 score. */
  def macroF1(truth: Seq[Int], pred: Seq[Int]): Double = {
    val labels = (truth ++ pred).distinct
    val f1s = labels.map { l =>
      val tp = truth.zip(pred).count { case (t, p) => t == l && p == l }
      val fp = truth.zip(pred).count { case (t, p) => t != l && p == l }
      val fn = truth.zip(pred).count { case (t, p) => t == l && p != l }
      if (2 * tp + fp + fn == 0) 0.0 else 2.0 * tp / (2 * tp + fp + fn)
    }
    f1s.sum / f1s.size
  }

  /** Train/test evaluation with K grid-searched by leave-one-out on the
    * training set (the paper selects the best K via grid search).
    */
  def evaluate(train: Seq[LabeledSeries], test: Seq[LabeledSeries],
               ks: Seq[Int] = Seq(1, 3, 5, 7)): Double = {
    val trainF = train.map(s => (features(s.points), s.label))
    val testF = test.map(s => features(s.points))
    val bestK = ks.maxBy { k =>
      // leave-one-out on train
      val preds = trainF.indices.map { i =>
        val rest = trainF.patch(i, Nil, 1)
        predict(rest, Seq(trainF(i)._1), k).head
      }
      macroF1(trainF.map(_._2), preds)
    }
    macroF1(test.map(_.label), predict(trainF, testF, bestK))
  }
}
