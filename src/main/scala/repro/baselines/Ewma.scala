package repro.baselines

import repro.core.{Cleaner, TimePoint}

/** EWMA [16] — exponentially weighted moving average smoothing:
  * x'_k = lambda * x_k + (1 - lambda) * x'_{k-1}. Touches essentially
  * every point (the paper's over-repair example).
  */
final case class Ewma(lambda: Double = 0.3) extends Cleaner {
  require(lambda > 0 && lambda <= 1)
  override def name: String = "EWMA"

  override def clean(xs: Array[TimePoint]): Array[TimePoint] = {
    val out = TimePoint.copyOf(xs)
    var k = 1
    while (k < xs.length) {
      var l = 0
      while (l < out(k).v.length) {
        out(k).v(l) = lambda * xs(k).v(l) + (1 - lambda) * out(k - 1).v(l)
        l += 1
      }
      k += 1
    }
    out
  }
}
