package repro.spark

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Cleaner, SeriesRow, TimePoint}

/** Batch Spark execution of the cleaners: a windowed DataFrame job
  * computing the speed-constrained correction per partition (= per
  * logical series). Each series is one group key; rows are sorted by
  * timestamp inside the group and repaired with any registered
  * [[Cleaner]]. The sequential per-series algorithms are the paper's —
  * Spark contributes partition-parallelism across series and the SQL
  * surface for violation detection and metrics.
  */
object SparkCleaner {

  /** Lift in-memory series into a Dataset[SeriesRow]. */
  def toDS(spark: SparkSession, series: Seq[(Long, Array[TimePoint])]): Dataset[SeriesRow] = {
    import spark.implicits._
    series.flatMap { case (id, pts) => SeriesRow.fromPoints(id, pts) }.toDS()
  }

  /** Clean every series with `cleaner`, one group per seriesId. */
  def clean(ds: Dataset[SeriesRow], cleaner: Cleaner): Dataset[SeriesRow] = {
    import ds.sparkSession.implicits._
    ds.groupByKey(_.seriesId).flatMapGroups { (id, rows) =>
      val pts = SeriesRow.toPoints(rows.toSeq)
      SeriesRow.fromPoints(id, cleaner.clean(pts)).iterator
    }
  }

  /** Collect a cleaned Dataset back to per-series point arrays. */
  def collectSeries(ds: Dataset[SeriesRow]): Map[Long, Array[TimePoint]] =
    ds.collect().groupBy(_.seriesId).map { case (id, rows) =>
      id -> SeriesRow.toPoints(rows.toSeq)
    }

  /** Flatten to one column per dimension (series_id, t, v0..v{D-1}) —
    * the SQL-facing shape shared with the DuckDB oracle.
    */
  def toFlatDF(ds: Dataset[SeriesRow], dims: Int): DataFrame = {
    val cols = col("seriesId").as("series_id") +: col("t") +:
      (0 until dims).map(l => element_at(col("dims"), l + 1).as(s"v$l"))
    ds.toDF().select(cols: _*)
  }

  /** SQL detecting consecutive-pair speed violations, written to run
    * identically on Spark and DuckDB (all columns explicitly cast, since
    * the oracle stages tables as VARCHAR). One row per point with its
    * consecutive Euclidean speed and a violation flag.
    */
  def violationSql(table: String, dims: Int, s: Double): String = {
    val vcols = (0 until dims).map(l => s"CAST(v$l AS DOUBLE)")
    val lagDiffs = vcols.map(v => s"($v - LAG($v) OVER w)")
    val distExpr = "SQRT(" + lagDiffs.map(d => s"$d * $d").mkString(" + ") + ")"
    s"""SELECT series_id, t, speed,
       |       CASE WHEN speed > $s THEN 1 ELSE 0 END AS violation
       |FROM (
       |  SELECT CAST(series_id AS BIGINT) AS series_id,
       |         CAST(t AS DOUBLE) AS t,
       |         $distExpr / (CAST(t AS DOUBLE) - LAG(CAST(t AS DOUBLE)) OVER w) AS speed
       |  FROM $table
       |  WINDOW w AS (PARTITION BY series_id ORDER BY CAST(t AS DOUBLE))
       |) sub
       |WHERE speed IS NOT NULL""".stripMargin
  }

  /** Run [[violationSql]] on Spark over a flat DataFrame. */
  def violations(flat: DataFrame, dims: Int, s: Double): DataFrame = {
    val view = s"ts_viol_${System.nanoTime()}"
    flat.createOrReplaceTempView(view)
    flat.sparkSession.sql(violationSql(view, dims, s))
  }

  /** SQL computing RMSE between a repaired and a truth table (joined on
    * series_id + t) — also oracle-compatible.
    */
  def rmseSql(repairedTable: String, truthTable: String, dims: Int): String = {
    val sq = (0 until dims)
      .map(l => s"(CAST(r.v$l AS DOUBLE) - CAST(g.v$l AS DOUBLE))")
      .map(d => s"$d * $d")
      .mkString(" + ")
    s"""SELECT SQRT(AVG($sq)) AS rmse
       |FROM $repairedTable r
       |JOIN $truthTable g
       |  ON CAST(r.series_id AS BIGINT) = CAST(g.series_id AS BIGINT)
       | AND CAST(r.t AS DOUBLE) = CAST(g.t AS DOUBLE)""".stripMargin
  }
}
