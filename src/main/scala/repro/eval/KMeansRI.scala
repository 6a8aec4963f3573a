package repro.eval

import java.util.Random
import repro.data.TimeSeriesGen.LabeledSeries

/** K-means (Lloyd's algorithm, seeded) + Rand Index (Section 5.5). */
object KMeansRI {

  /** Cluster feature vectors into k groups; returns assignments. */
  def kmeans(features: Seq[Array[Double]], k: Int, seed: Long = 0, iters: Int = 50): Seq[Int] = {
    require(features.nonEmpty && k >= 1)
    val r = new Random(seed)
    val n = features.size
    val dim = features.head.length
    // k-means++-style spread-out init: distinct random points.
    val centerIdx = r.ints(0, n).distinct().limit(k).toArray
    var centers = centerIdx.map(features(_).clone()).toArray
    var assign = Seq.fill(n)(0)
    var it = 0
    var changed = true
    while (it < iters && changed) {
      val newAssign = features.map { f =>
        centers.indices.minBy(c => Knn.euclid(f, centers(c)))
      }
      changed = newAssign != assign
      assign = newAssign
      centers = Array.tabulate(k) { c =>
        val members = features.zip(assign).collect { case (f, a) if a == c => f }
        if (members.isEmpty) centers(c)
        else {
          val acc = Array.fill(dim)(0.0)
          members.foreach(f => (0 until dim).foreach(i => acc(i) += f(i)))
          acc.map(_ / members.size)
        }
      }
      it += 1
    }
    assign
  }

  /** Rand Index between a clustering and the true labels. */
  def randIndex(truth: Seq[Int], assign: Seq[Int]): Double = {
    require(truth.size == assign.size)
    val n = truth.size
    if (n < 2) return 1.0
    var agree = 0L
    var total = 0L
    for (i <- 0 until n; j <- i + 1 until n) {
      val sameTruth = truth(i) == truth(j)
      val sameAssign = assign(i) == assign(j)
      if (sameTruth == sameAssign) agree += 1
      total += 1
    }
    agree.toDouble / total
  }

  /** Cluster labelled series and score with RI. */
  def evaluate(series: Seq[LabeledSeries], seed: Long = 0): Double = {
    val k = series.map(_.label).distinct.size
    val feats = series.map(s => Knn.features(s.points))
    randIndex(series.map(_.label), kmeans(feats, k, seed))
  }
}
