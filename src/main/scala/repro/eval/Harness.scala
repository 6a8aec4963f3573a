package repro.eval

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core._
import repro.spark.SparkCleaner

/** Runs the full method zoo over a (dirty, truth) pair and collects the
  * paper's metrics. Distributed execution goes through
  * [[repro.spark.SparkCleaner]]; single-series inputs are cleaned
  * directly (one group) so timing reflects the algorithm.
  */
object Harness {

  /** One result row of a comparison table. */
  final case class ResultRow(method: String, rmse: Double, repairDistance: Double,
                             repairCount: Int, repairFraction: Double, millis: Long) {
    def fmt(n: Int): String =
      f"$method%-10s ${rmse}%8.4f ${repairDistance}%10.4f   $repairCount%6d(${repairFraction * 100}%5.2f%%) ${millis}%6d ms"
  }

  /** Constraint configuration for one experiment. All constraint-based
    * methods receive constraints of the same provenance so the
    * comparison stays fair; HTD additionally gets truth-derived limits
    * (the paper grants it those labels).
    */
  final case class Config(
      sc: SpeedConstraint,                 // multivariate constraint (MTCSC-*)
      uniScs: Array[SpeedConstraint],      // per-dimension constraints (univariate methods)
      adaptive: Option[MtcscA] = None,     // preconfigured MTCSC-A if wanted
  )

  /** Expert-style constraint capture: percentile of the reference
    * series' speeds with a small slack factor (the paper uses domain
    * knowledge or a 95% confidence level; Section 4 motivates why pure
    * dirty-data capture is fragile).
    */
  def configFrom(reference: Array[TimePoint], w: Double,
                 percentile: Double = 0.99, slack: Double = 1.15): Config = {
    val s = SpeedConstraint.quantile(SpeedConstraint.consecutiveSpeeds(reference), percentile) * slack
    val sc = SpeedConstraint(math.max(s, 1e-9), w)
    val d = reference(0).dim
    val uniScs = Array.tabulate(d) { l =>
      val uni = reference.map(p => TimePoint.uni(p.t, p.v(l)))
      val su = SpeedConstraint.quantile(SpeedConstraint.consecutiveSpeeds(uni), percentile) * slack
      SpeedConstraint(math.max(su, 1e-9), w)
    }
    Config(sc, uniScs)
  }

  /** The standard method zoo for a comparison table. `truth` is needed
    * only by HTD's labelled capture.
    */
  def methods(cfg: Config, truth: Array[TimePoint], includeG: Boolean = true,
              includeAdaptive: Boolean = false): Seq[Cleaner] = {
    val base = Seq.newBuilder[Cleaner]
    if (includeG) base += MtcscG(cfg.sc)
    base += MtcscL(cfg.sc)
    base += MtcscC(cfg.sc)
    if (includeAdaptive) base += cfg.adaptive.getOrElse(MtcscA(cfg.sc))
    base += MtcscUni(cfg.uniScs)
    base += Screen(cfg.uniScs)
    base += SpeedAcc(cfg.uniScs, cfg.uniScs.map(_.s * 2)) // symmetric accel cap
    base += LsGreedy()
    base += Ewma()
    base += Rcsws()
    base += Htd.captureFromTruth(truth, cfg.sc.w)
    base += HoloCleanLite(cfg.uniScs)
    base += TranAdLite()
    base += CaeMLite()
    base.result()
  }

  /** Clean one series with one method through the Spark path and score it. */
  def run(spark: SparkSession, cleaner: Cleaner,
          dirty: Array[TimePoint], truth: Array[TimePoint]): ResultRow = {
    val ds = SparkCleaner.toDS(spark, Seq(0L -> dirty))
    val (repaired, ms) = Metrics.timed {
      SparkCleaner.collectSeries(SparkCleaner.clean(ds, cleaner))(0L)
    }
    score(cleaner.name, repaired, dirty, truth, ms)
  }

  def score(name: String, repaired: Array[TimePoint],
            dirty: Array[TimePoint], truth: Array[TimePoint], ms: Long): ResultRow =
    ResultRow(name, Metrics.rmse(repaired, truth), Metrics.repairDistance(repaired, dirty),
      Metrics.repairCount(repaired, dirty), Metrics.repairFraction(repaired, dirty), ms)

  /** Run a whole method zoo; prepends the Dirty row (no repair). */
  def runAll(spark: SparkSession, cleaners: Seq[Cleaner],
             dirty: Array[TimePoint], truth: Array[TimePoint]): Seq[ResultRow] = {
    val dirtyRow = ResultRow("Dirty", Metrics.rmse(dirty, truth), 0.0, 0, 0.0, 0)
    dirtyRow +: cleaners.map(c => run(spark, c, dirty, truth))
  }

  def formatTable(title: String, rows: Seq[ResultRow]): String = {
    val header = f"${"method"}%-10s ${"RMSE"}%8s ${"repairDist"}%10s ${"repairNum"}%15s ${"time"}%9s"
    (s"== $title ==" +: header +: rows.map(_.fmt(0))).mkString("\n")
  }
}
