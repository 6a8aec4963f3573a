package repro.core

import scala.collection.mutable.ArrayDeque

/** MTCSC-A — MTCSC-C with an adaptively re-captured speed constraint
  * (Algorithm 5).
  *
  * Consecutive-pair speeds of the raw observations are pushed through two
  * adjacent sliding windows W1, W2 of `m` speeds each. Both are bucketed
  * into `b` equal intervals over [0, s] (the last bucket is the overflow
  * (s, inf)); when the KL divergence KL(W1 || W2) exceeds `tau` the data
  * characteristic changed and the constraint is re-captured as the 95th
  * percentile of W2 divided by `beta`.
  */
final case class MtcscA(
    initial: SpeedConstraint,
    b: Int = 6,
    tau: Double = 0.75,
    m: Int = 150,
    beta: Double = 0.75,
) extends Cleaner {
  override def name: String = "MTCSC-A"

  override def clean(xs: Array[TimePoint]): Array[TimePoint] = {
    val out = TimePoint.copyOf(xs)
    val state = new MtcscA.AdaptiveState(b, tau, m, beta)
    var s = initial.s
    var k = 1
    while (k < xs.length) {
      s = state.update(xs(k - 1), xs(k), s)
      MtcscC.step(out, xs, k, SpeedConstraint(s, initial.w))
      k += 1
    }
    out
  }
}

object MtcscA {

  /** Mutable Algorithm 5 state: two adjacent speed windows. Raw speeds
    * are stored (not bucket ids) so UpdateDistribution under a changed
    * constraint is a pure re-bucketing of the same values.
    */
  final class AdaptiveState(b: Int, tau: Double, m: Int, beta: Double) {
    private val w1 = ArrayDeque.empty[Double]
    private val w2 = ArrayDeque.empty[Double]

    /** Feed the speed of (p -> k); returns the (possibly updated) s. */
    def update(p: TimePoint, k: TimePoint, s: Double): Double = {
      val dt = k.t - p.t
      if (dt <= 0) return s
      val s1 = k.dist(p) / dt
      var out = s
      if (w1.size < m) w1.append(s1)
      else if (w2.size < m) w2.append(s1)
      else {
        if (kl(distribution(w1, b, s), distribution(w2, b, s)) > tau)
          out = SpeedConstraint.quantile(w2.toArray, 0.95) / beta
        val s2 = w2.removeHead()
        w1.append(s2); w1.removeHead()
        w2.append(s1)
      }
      out
    }
  }

  /** Bucket counts: b-1 equal intervals over [0, s] plus overflow (s, inf).
    * (Example 4.1: s = 2.2, b = 6 yields interval width 0.44.)
    */
  def bucketCounts(speeds: Iterable[Double], b: Int, s: Double): Array[Int] = {
    val counts = Array.fill(b)(0)
    val width = s / (b - 1)
    for (v <- speeds) {
      val idx = if (v > s) b - 1 else math.min(b - 2, math.max(0, math.ceil(v / width).toInt - 1))
      counts(idx) += 1
    }
    counts
  }

  /** Normalized probability distribution over the buckets. */
  def distribution(speeds: Iterable[Double], b: Int, s: Double): Array[Double] = {
    val counts = bucketCounts(speeds, b, s)
    val total = counts.sum.toDouble
    if (total == 0) Array.fill(b)(0.0) else counts.map(_ / total)
  }

  /** KL divergence with natural log; 0-probability p terms contribute 0,
    * 0-probability q terms are clamped to avoid infinities.
    */
  def kl(p: Array[Double], q: Array[Double]): Double = {
    require(p.length == q.length)
    var acc = 0.0
    var i = 0
    while (i < p.length) {
      if (p(i) > 0) acc += p(i) * math.log(p(i) / math.max(q(i), 1e-10))
      i += 1
    }
    acc
  }
}
