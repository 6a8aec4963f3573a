package repro.core

import scala.collection.mutable

/** MTCSC-C — online cleaning via window clustering (Algorithms 3 + 4).
  *
  * For each key point k the succeeding points inside the window are
  * grouped into speed-compatibility clusters anchored on the previous
  * repaired point (BuildCluster). The first point of the largest cluster
  * is the trend representative; if the key point is incompatible with
  * either the previous repair or that representative it is repaired onto
  * the interpolation line (formula (6)). Unlike MTCSC-L this also fixes
  * *small errors* that satisfy the constraint but sit off the trend.
  */
final case class MtcscC(sc: SpeedConstraint) extends Cleaner {
  override def name: String = "MTCSC-C"

  override def clean(xs: Array[TimePoint]): Array[TimePoint] = {
    val out = TimePoint.copyOf(xs)
    var k = 1
    while (k < xs.length) {
      MtcscC.step(out, xs, k, sc)
      k += 1
    }
    out
  }
}

object MtcscC {

  /** Cluster flags (Algorithm 3 uses 0 / -1 / >0; 0-based indices force a
    * distinct encoding): OMIT = dirty/default, HEAD = first point of a
    * cluster, values >= 0 = head index of the cluster joined.
    */
  private final val OMIT = -2
  private final val HEAD = -1

  /** BuildCluster (Algorithm 3) over the succeeding points of a window.
    *
    * @param p  the last repaired point before the window (x'_{k-1})
    * @param w  the succeeding points x_{k+1}.. inside the window
    * @return   clusters in creation order; each cluster lists relative
    *           indices into `w`, first element = cluster head
    */
  def buildClusters(p: TimePoint, w: Array[TimePoint], sc: SpeedConstraint): Seq[Seq[Int]] = {
    val n = w.length
    if (n == 0) return Seq.empty
    val f = Array.fill(n)(OMIT)
    val map = mutable.LinkedHashMap.empty[Int, mutable.ArrayBuffer[Int]]
    // Lines 3-6: first point compatible with p starts the first cluster.
    var head = -1
    var l = 0
    while (l < n && head < 0) {
      if (sc.speedOk(p, w(l))) { head = l; f(l) = HEAD; map(l) = mutable.ArrayBuffer(l) }
      else l += 1
    }
    if (head < 0) return Seq.empty
    var i = head + 1
    while (i < n) {
      var j = i - 1
      var done = false
      while (!done && j >= head) {
        if (sc.speedOk(w(i), w(j))) {
          // Action 1 — join j's cluster; a hit on an omitted j leaves i
          // omitted too (similar properties to a dirty point).
          if (f(j) == HEAD) { f(i) = j; map(j) += i }
          else if (f(j) >= 0) { f(i) = f(j); map(f(i)) += i }
          done = true
        } else if (j == head || f(j) >= 0) {
          // Action 2 — try to open a new cluster, anchored on p.
          if (sc.speedOk(p, w(i))) { f(i) = HEAD; map(i) = mutable.ArrayBuffer(i) }
          done = true
        } else {
          j -= 1 // Action 3 — j is a cluster head or omitted: look further back
        }
      }
      i += 1
    }
    map.values.map(_.toSeq).toSeq
  }

  /** One Algorithm 4 iteration for key point k; repairs out(k) in place.
    * Factored out so MTCSC-A can reuse it with an evolving constraint.
    */
  def step(out: Array[TimePoint], xs: Array[TimePoint], k: Int, sc: SpeedConstraint): Unit = {
    val n = xs.length
    var end = k + 1
    while (end < n && xs(end).t <= xs(k).t + sc.w) end += 1
    val window = xs.slice(k + 1, end)
    val clusters = buildClusters(out(k - 1), window, sc)
    if (clusters.nonEmpty) {
      val rep = k + 1 + clusters.maxBy(_.size).head // first point of largest cluster
      if (!(sc.speedOk(out(k - 1), xs(k)) && sc.speedOk(xs(k), xs(rep)))) {
        val alpha = (xs(k).t - out(k - 1).t) / (xs(rep).t - out(k - 1).t)
        var l = 0
        while (l < out(k).v.length) {
          out(k).v(l) = alpha * (xs(rep).v(l) - out(k - 1).v(l)) + out(k - 1).v(l)
          l += 1
        }
      }
    } else if (!sc.speedOk(out(k - 1), xs(k))) {
      // Empty cluster set — the paper's Algorithm 4 leaves this case
      // unspecified (line 9's argmax needs a cluster). Copying the
      // previous repair creates an absorbing flatline once the series
      // outruns it; instead take the minimum-change feasible repair:
      // project the observation onto the previous repair's speed ball
      // (sound by construction, and it keeps tracking the data).
      val p = out(k - 1)
      val dt = xs(k).t - p.t
      val d = xs(k).dist(p)
      val scale = if (d > 0) sc.s * dt / d else 0.0
      var l = 0
      while (l < out(k).v.length) {
        out(k).v(l) = p.v(l) + scale * (xs(k).v(l) - p.v(l))
        l += 1
      }
    }
  }
}
