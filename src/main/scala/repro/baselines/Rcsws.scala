package repro.baselines

import repro.core.{Cleaner, TimePoint}

/** RCSWS [15] (GPSClean) — range constraints + sliding-window statistics,
  * designed for 2-D GPS data (our implementation is D-generic).
  *
  * A trailing window of recent points yields a per-dimension median and
  * MAD; an observation whose deviation from the window median exceeds
  * `c * MAD` (the range constraint) is repaired to the window median in
  * the violating dimensions. Oversimplified by design — the paper notes
  * RCSWS "suffers from oversimplified considerations regarding the data".
  */
final case class Rcsws(windowSize: Int = 10, c: Double = 4.0) extends Cleaner {
  override def name: String = "RCSWS"

  override def clean(xs: Array[TimePoint]): Array[TimePoint] = {
    val out = TimePoint.copyOf(xs)
    val n = xs.length
    if (n == 0) return out
    val d = xs(0).dim
    // Warm-up: a window with < windowSize points has a degenerate MAD
    // (often 0), which would flatten the head of the series.
    var k = windowSize
    while (k < n) {
      val lo = math.max(0, k - windowSize)
      var l = 0
      while (l < d) {
        // Statistics come from the *observations* — feeding repairs back
        // in would let one repair flatten the rest of a moving series.
        val win = Array.tabulate(k - lo)(i => xs(lo + i).v(l))
        val med = PerDim.median(win)
        val mad = PerDim.median(win.map(v => math.abs(v - med)))
        val range = c * math.max(mad, 1e-6)
        if (math.abs(xs(k).v(l) - med) > range) out(k).v(l) = med
        l += 1
      }
      k += 1
    }
    out
  }
}
