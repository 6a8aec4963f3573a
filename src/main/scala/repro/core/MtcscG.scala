package repro.core

/** MTCSC-G — global optimal repair (Algorithm 1).
  *
  * Finds the longest subsequence whose consecutive points are pairwise
  * compatible with the speed constraint (an extension of the longest
  * increasing subsequence problem); every point off that chain is in the
  * FixList and repaired by interpolating between its nearest preceding
  * and succeeding clean points (formula (6)).
  *
  * Compatibility here is the *pure* speed test `d <= s * dt` with no
  * window exemption, matching how the paper's algorithms use satisfy.
  * (If pairs beyond the window were treated as unconstrained — a literal
  * reading of formulation (3) — a keep-set could place a fix point
  * within `w` of two mutually-unconstrained anchors whose candidate
  * balls do not intersect, making the repair infeasible; the pure test
  * excludes that case and makes interpolation provably sound, see
  * DESIGN.md.) Complexity O(Dn²) as in the paper.
  */
final case class MtcscG(sc: SpeedConstraint) extends Cleaner {
  override def name: String = "MTCSC-G"

  override def clean(xs: Array[TimePoint]): Array[TimePoint] = {
    if (xs.length <= 1) return TimePoint.copyOf(xs)
    MtcscG.repair(xs, MtcscG.fixList(xs, sc))
  }
}

object MtcscG {

  /** The paper's Algorithm 1: O(n²) longest-compatible-chain DP. Returns
    * the sorted indices of points that must be fixed (FixList).
    */
  def fixList(xs: Array[TimePoint], sc: SpeedConstraint): Array[Int] = {
    val n = xs.length
    val dp = Array.fill(n)(1)
    val pre = Array.fill(n)(-1)
    var maxLen = 0
    var endIdx = 0
    var i = 0
    while (i < n) {
      var j = 0
      while (j < i) {
        if (sc.speedOk(xs(i), xs(j)) && dp(i) < dp(j) + 1) {
          dp(i) = dp(j) + 1
          pre(i) = j
        }
        j += 1
      }
      if (dp(i) > maxLen) { maxLen = dp(i); endIdx = i }
      i += 1
    }
    val clean = Array.fill(n)(false)
    var k = endIdx
    while (k >= 0) { clean(k) = true; k = pre(k) }
    (0 until n).filterNot(clean).toArray
  }

  /** Interpolation repair (formula (6)) of every FixList point between its
    * nearest clean neighbours; clean points are returned unchanged.
    */
  def repair(xs: Array[TimePoint], fixes: Array[Int]): Array[TimePoint] = {
    val out = TimePoint.copyOf(xs)
    if (fixes.isEmpty) return out
    val isFix = Array.fill(xs.length)(false)
    fixes.foreach(isFix(_) = true)
    for (i <- fixes) {
      var p = i - 1
      while (p >= 0 && isFix(p)) p -= 1
      var m = i + 1
      while (m < xs.length && isFix(m)) m += 1
      (p >= 0, m < xs.length) match {
        case (true, true) =>
          val alpha = (xs(i).t - xs(p).t) / (xs(m).t - xs(p).t)
          var l = 0
          while (l < out(i).v.length) {
            out(i).v(l) = alpha * (xs(m).v(l) - xs(p).v(l)) + xs(p).v(l)
            l += 1
          }
        case (true, false) => Array.copy(xs(p).v, 0, out(i).v, 0, out(i).v.length)
        case (false, true) => Array.copy(xs(m).v, 0, out(i).v, 0, out(i).v.length)
        case _             => () // single-point series: nothing to anchor on
      }
    }
    out
  }
}
