package repro.spark

import repro.{Oracle, SparkSpec}

/** The oracle must itself be trustworthy: it has to accept matching
  * results and reject wrong ones — otherwise every "oracle-checked"
  * test is vacuous.
  */
class OracleSelfSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  private def table() = {
    import spark.implicits._
    Seq((1L, 10.0), (2L, 20.0), (3L, 30.0)).toDF("k", "v")
  }

  test("oracle accepts an equivalent aggregate") {
    val t = table()
    val sparkDf = t.agg(sum(col("v").cast("double")).as("total"))
    Oracle.assertEquivalent(sparkDf, "SELECT SUM(CAST(v AS DOUBLE)) AS total FROM t", "t" -> t)
  }

  test("oracle rejects a wrong aggregate") {
    val t = table()
    val wrong = t.agg((sum(col("v").cast("double")) + 1).as("total"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT SUM(CAST(v AS DOUBLE)) AS total FROM t", "t" -> t)
    }
  }

  test("oracle rejects mismatched column sets") {
    val t = table()
    val sparkDf = t.agg(sum(col("v").cast("double")).as("other_name"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(sparkDf, "SELECT SUM(CAST(v AS DOUBLE)) AS total FROM t", "t" -> t)
    }
  }

  test("oracle handles nulls consistently") {
    import spark.implicits._
    val t = Seq((1L, Some(10.0)), (2L, None)).toDF("k", "v")
    val sparkDf = t.select(col("k").cast("long").as("k"), col("v").cast("double").as("v"))
    Oracle.assertEquivalent(sparkDf,
      "SELECT CAST(k AS BIGINT) AS k, CAST(v AS DOUBLE) AS v FROM t", "t" -> t)
  }
}
