package repro.spark

import repro.{Oracle, SparkSpec, SynthData}
import repro.core._
import repro.data.{ErrorInjector, TimeSeriesGen}
import repro.eval.Metrics

class SparkCleanerSpec extends SparkSpec {

  private lazy val gps = TimeSeriesGen.gpsWalk(400, seed = 3)
  private val sc2 = SpeedConstraint(2.5, 10.0)

  test("distributed clean equals sequential clean per series") {
    val seriesA = TimeSeriesGen.gpsWalk(300, seed = 1).dirty
    val seriesB = TimeSeriesGen.gpsWalk(300, seed = 2).dirty
    val ds = SparkCleaner.toDS(spark, Seq(0L -> seriesA, 1L -> seriesB))
    val out = SparkCleaner.collectSeries(SparkCleaner.clean(ds, MtcscC(sc2)))
    val seqA = MtcscC(sc2).clean(seriesA)
    val seqB = MtcscC(sc2).clean(seriesB)
    assert(out(0L).indices.forall(i => out(0L)(i).sameValues(seqA(i), 1e-9)))
    assert(out(1L).indices.forall(i => out(1L)(i).sameValues(seqB(i), 1e-9)))
  }

  test("distributed clean with MTCSC-G equals sequential") {
    val series = TimeSeriesGen.stock(300, seed = 5)
    val dirty = ErrorInjector.inject(series, 0.1, ErrorInjector.Together, 1)
    val sc = SpeedConstraint(2.0, 5.0)
    val ds = SparkCleaner.toDS(spark, Seq(7L -> dirty))
    val out = SparkCleaner.collectSeries(SparkCleaner.clean(ds, MtcscG(sc)))(7L)
    val seqOut = MtcscG(sc).clean(dirty)
    assert(out.indices.forall(i => out(i).sameValues(seqOut(i), 1e-9)))
  }

  test("many series are cleaned independently and all keys survive") {
    val series = (0 until 20).map(i => i.toLong -> TimeSeriesGen.stock(50, seed = i))
    val ds = SparkCleaner.toDS(spark, series)
    val out = SparkCleaner.collectSeries(SparkCleaner.clean(ds, MtcscL(SpeedConstraint(2.0, 5.0))))
    assert(out.keySet == series.map(_._1).toSet)
    assert(out.values.forall(_.length == 50))
  }

  test("toFlatDF produces one column per dimension") {
    val ds = SparkCleaner.toDS(spark, Seq(0L -> gps.dirty))
    val flat = SparkCleaner.toFlatDF(ds, dims = 2)
    assert(flat.columns.toSeq == Seq("series_id", "t", "v0", "v1"))
    assert(flat.count() == gps.dirty.length)
  }

  test("violation detection SQL agrees with DuckDB (oracle)") {
    val ds = SparkCleaner.toDS(spark, Seq(0L -> gps.dirty.take(200)))
    val flat = SparkCleaner.toFlatDF(ds, dims = 2).cache()
    val sparkDf = SparkCleaner.violations(flat, dims = 2, s = 2.5)
    Oracle.assertEquivalent(sparkDf, SparkCleaner.violationSql("ts", 2, 2.5), "ts" -> flat)
  }

  test("violation flags match the in-memory speed test") {
    val pts = gps.dirty.take(200)
    val ds = SparkCleaner.toDS(spark, Seq(0L -> pts))
    val flat = SparkCleaner.toFlatDF(ds, dims = 2)
    val viol = SparkCleaner.violations(flat, 2, 2.5)
      .collect().map(r => r.getDouble(1) -> r.getInt(3)).toMap
    val scTest = SpeedConstraint(2.5, 1.0)
    for (i <- 1 until pts.length) {
      val expected = if (scTest.speedOk(pts(i - 1), pts(i))) 0 else 1
      assert(viol(pts(i).t) == expected, s"t=${pts(i).t}")
    }
  }

  test("RMSE SQL agrees with DuckDB (oracle) and the in-memory metric") {
    val repaired = MtcscC(sc2).clean(gps.dirty)
    val repairedFlat = SparkCleaner.toFlatDF(SparkCleaner.toDS(spark, Seq(0L -> repaired)), 2).cache()
    val truthFlat = SparkCleaner.toFlatDF(SparkCleaner.toDS(spark, Seq(0L -> gps.truth)), 2).cache()
    val view1 = "repaired_tbl"; val view2 = "truth_tbl"
    repairedFlat.createOrReplaceTempView(view1)
    truthFlat.createOrReplaceTempView(view2)
    val sql = SparkCleaner.rmseSql(view1, view2, 2)
    val sparkDf = spark.sql(sql)
    Oracle.assertEquivalent(sparkDf, SparkCleaner.rmseSql("repaired_tbl", "truth_tbl", 2),
      "repaired_tbl" -> repairedFlat, "truth_tbl" -> truthFlat)
    val sqlRmse = sparkDf.collect()(0).getDouble(0)
    assert(math.abs(sqlRmse - Metrics.rmse(repaired, gps.truth)) < 1e-6)
  }

  test("SynthData.timeSeries exposes the generators as DataFrames") {
    for (name <- Seq("stock", "ild", "gpswalk")) {
      val df = SynthData.timeSeries(spark, name, n = 100)
      assert(df.count() == 100, name)
      assert(df.columns.toSeq == Seq("seriesId", "t", "dims"), name)
    }
    intercept[IllegalArgumentException](SynthData.timeSeries(spark, "nope", 10))
  }

  test("cleaning improves RMSE end-to-end through the Spark path") {
    val ds = SparkCleaner.toDS(spark, Seq(0L -> gps.dirty))
    val out = SparkCleaner.collectSeries(SparkCleaner.clean(ds, MtcscC(sc2)))(0L)
    assert(Metrics.rmse(out, gps.truth) < Metrics.rmse(gps.dirty, gps.truth))
  }
}
