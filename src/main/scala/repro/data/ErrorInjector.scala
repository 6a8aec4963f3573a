package repro.data

import java.util.Random
import repro.core.TimePoint

/** Synthetic error injection following the paper's protocol ([33],
  * Section 5.1.1): a random e% of points is replaced with uniform values
  * between the dimension's min and max. Patterns (Section 5.3.3):
  *
  *  - `Separate`: each dimension is hit independently (e% of cells per
  *    dimension, split over the dimensions so e% of points are affected
  *    in total, one dimension each);
  *  - `Together`: all dimensions of a selected point are replaced at
  *    once (sensor-failure model).
  */
object ErrorInjector {

  sealed trait Pattern
  case object Separate extends Pattern
  case object Together extends Pattern

  /** Inject errors at `rate` (fraction of points) with the pattern. */
  def inject(truth: Array[TimePoint], rate: Double, pattern: Pattern, seed: Long): Array[TimePoint] = {
    require(rate >= 0 && rate < 1, s"bad error rate $rate")
    val r = new Random(seed)
    val n = truth.length
    val d = truth(0).dim
    val dirty = TimePoint.copyOf(truth)
    val mins = Array.tabulate(d)(l => truth.map(_.v(l)).min)
    val maxs = Array.tabulate(d)(l => truth.map(_.v(l)).max)
    val nErr = math.round(rate * n).toInt
    val targets = pick(n, nErr, r)
    pattern match {
      case Together =>
        for (i <- targets; l <- 0 until d)
          dirty(i).v(l) = mins(l) + r.nextDouble() * (maxs(l) - mins(l))
      case Separate =>
        // e% of points in total, each corrupted in exactly one dimension,
        // spread uniformly over the dimensions.
        for (i <- targets) {
          val l = r.nextInt(d)
          dirty(i).v(l) = mins(l) + r.nextDouble() * (maxs(l) - mins(l))
        }
    }
    dirty
  }

  /** Sample `k` distinct indices from [1, n) — the first point stays
    * clean (every online method anchors on it).
    */
  private def pick(n: Int, k: Int, r: Random): Seq[Int] = {
    val idx = scala.collection.mutable.LinkedHashSet.empty[Int]
    val limit = math.min(k, n - 1)
    while (idx.size < limit) idx += (1 + r.nextInt(n - 1))
    idx.toSeq
  }
}
