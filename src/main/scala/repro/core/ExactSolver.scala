package repro.core

/** Exact minimum-fix reference — substitute for the paper's Gurobi
  * MIQP/MILP formulation (Section 2.2.1).
  *
  * The paper only uses the solver to establish the global optimum that
  * MTCSC-G's DP then matches (Examples 2.5/2.6). The container is offline
  * and Gurobi is proprietary, so we enumerate keep-subsets instead: a
  * subset of points may stay unchanged iff it is pairwise compatible
  * under the pure speed test (the semantics the paper's algorithms use,
  * see MtcscG's doc); the minimum fix is n minus the largest such subset
  * (repaired points can then always be placed by interpolation,
  * Propositions 3.1/3.2). Exponential — intended for n ≤ ~18 in tests.
  */
object ExactSolver {

  /** Minimum number of points that must be repaired. */
  def minFixCount(xs: Array[TimePoint], sc: SpeedConstraint): Int =
    xs.length - maxKeep(xs, sc)._1

  /** Indices of one optimal FixList (lexicographically-first keep set). */
  def minFixList(xs: Array[TimePoint], sc: SpeedConstraint): Array[Int] = {
    val keep = maxKeep(xs, sc)._2
    (0 until xs.length).filterNot(keep.contains).toArray
  }

  private def maxKeep(xs: Array[TimePoint], sc: SpeedConstraint): (Int, Set[Int]) = {
    val n = xs.length
    require(n <= 22, s"ExactSolver is an exponential reference, n=$n is too large")
    if (n == 0) return (0, Set.empty)
    // Precompute pairwise compatibility (pure speed test, see class doc).
    val ok = Array.ofDim[Boolean](n, n)
    for (i <- 0 until n; j <- 0 until n) ok(i)(j) = sc.speedOk(xs(i), xs(j))
    var best = 0
    var bestMask = 0L
    var mask = 0L
    val limit = 1L << n
    while (mask < limit) {
      val size = java.lang.Long.bitCount(mask)
      if (size > best && feasible(mask, ok, n)) {
        best = size
        bestMask = mask
      }
      mask += 1
    }
    (best, (0 until n).filter(i => (bestMask & (1L << i)) != 0).toSet)
  }

  private def feasible(mask: Long, ok: Array[Array[Boolean]], n: Int): Boolean = {
    var i = 0
    while (i < n) {
      if ((mask & (1L << i)) != 0) {
        var j = i + 1
        while (j < n) {
          if ((mask & (1L << j)) != 0 && !ok(i)(j)) return false
          j += 1
        }
      }
      i += 1
    }
    true
  }
}
