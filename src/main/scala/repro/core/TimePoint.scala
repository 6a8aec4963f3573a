package repro.core

/** A single multivariate observation: value vector `v` at timestamp `t`.
  *
  * Timestamps are doubles (seconds, trading ticks, sample indices — the
  * algorithms only ever use differences). `v` has one entry per dimension.
  */
final case class TimePoint(t: Double, v: Array[Double]) {

  /** Number of dimensions D. */
  def dim: Int = v.length

  /** Euclidean distance to another point (Definition 2.2). */
  def dist(o: TimePoint): Double = {
    var acc = 0.0
    var l = 0
    while (l < v.length) { val d = v(l) - o.v(l); acc += d * d; l += 1 }
    math.sqrt(acc)
  }

  /** Value-equality with a tolerance — used to count repairs Δ(x', x). */
  def sameValues(o: TimePoint, eps: Double = 1e-9): Boolean = {
    var l = 0
    while (l < v.length) {
      if (math.abs(v(l) - o.v(l)) > eps) return false
      l += 1
    }
    true
  }

  override def toString: String = s"TimePoint($t, [${v.mkString(", ")}])"
}

object TimePoint {
  /** Convenience constructor for univariate points. */
  def uni(t: Double, x: Double): TimePoint = TimePoint(t, Array(x))

  /** Deep copy — repairs mutate value arrays, inputs must stay intact. */
  def copyOf(p: TimePoint): TimePoint = TimePoint(p.t, p.v.clone())

  /** Deep copy of a whole series. */
  def copyOf(xs: Array[TimePoint]): Array[TimePoint] = xs.map(copyOf)
}

/** Spark-facing row for one observation of one series.
  *
  * `seriesId` partitions the data (one logical time series per key);
  * rows within a key are sorted by `t` before cleaning.
  */
final case class SeriesRow(seriesId: Long, t: Double, dims: Seq[Double])

object SeriesRow {
  def toPoints(rows: Seq[SeriesRow]): Array[TimePoint] =
    rows.sortBy(_.t).map(r => TimePoint(r.t, r.dims.toArray)).toArray

  def fromPoints(seriesId: Long, pts: Array[TimePoint]): Seq[SeriesRow] =
    pts.toSeq.map(p => SeriesRow(seriesId, p.t, p.v.toSeq))
}
