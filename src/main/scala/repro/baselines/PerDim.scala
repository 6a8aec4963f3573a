package repro.baselines

import repro.core.{SpeedConstraint, TimePoint}

/** Helpers shared by the univariate baselines, which the paper applies to
  * multivariate data by cleaning every dimension separately.
  */
object PerDim {

  /** Clean each dimension with `clean1(ts, values, dim)` and reassemble. */
  def apply(xs: Array[TimePoint])(clean1: (Array[Double], Array[Double], Int) => Array[Double]): Array[TimePoint] = {
    if (xs.isEmpty) return Array.empty
    val ts = xs.map(_.t)
    val d = xs(0).dim
    val out = TimePoint.copyOf(xs)
    var l = 0
    while (l < d) {
      val repaired = clean1(ts, xs.map(_.v(l)), l)
      var i = 0
      while (i < xs.length) { out(i).v(l) = repaired(i); i += 1 }
      l += 1
    }
    out
  }

  /** Per-dimension speed constraints captured at the 95th percentile of
    * absolute consecutive univariate speeds — how the paper's univariate
    * competitors obtain their constraints from data.
    */
  def captureSpeeds(xs: Array[TimePoint], w: Double, percentile: Double = 0.95): Array[SpeedConstraint] = {
    val d = xs(0).dim
    Array.tabulate(d) { l =>
      val uni = xs.map(p => TimePoint.uni(p.t, p.v(l)))
      SpeedConstraint.capture(uni, w, percentile)
    }
  }

  /** Median of a non-empty sample. */
  def median(a: Array[Double]): Double = {
    val s = a.sorted
    val n = s.length
    if (n % 2 == 1) s(n / 2) else (s(n / 2 - 1) + s(n / 2)) / 2.0
  }
}
