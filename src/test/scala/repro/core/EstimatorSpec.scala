package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkFunSpec, TestData}
import repro.sampling.{GSW, Uniform}

/** Tests for the online aggregation phase: exact per-day series
  * (oracle-checked against DuckDB), sample-based estimation, day-gap
  * filling, and the future-truth window.
  */
class EstimatorSpec extends SparkFunSpec {

  private lazy val ad = TestData.ad

  private val task = ForecastTask("impression", "ad",
    Constraint(Seq(Pred("age", "<=", "40", isString = false),
                   Pred("gender", "=", "F", isString = true))),
    ts = 0, te = 14)

  test("exactSeries has one entry per training day") {
    assert(Estimator.exactSeries(ad, task).length == 15)
  }

  test("exactSeries matches a hand-built Spark aggregation") {
    val series = Estimator.exactSeries(ad, task)
    val direct = ad.filter(col("age") <= 40 && col("gender") === "F" && col("t") === 3)
      .agg(sum(col("impression"))).head.getLong(0).toDouble
    assert(series(3) == direct)
  }

  test("oracle: exactSeries equals DuckDB's per-day sums") {
    val series = Estimator.exactSeries(ad, task)
    val s = spark
    import s.implicits._
    val sparkDf = series.zipWithIndex
      .map { case (v, i) => (i.toString, v.toLong) }.toSeq
      .toDF("t", "total")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT t, SUM(CAST(impression AS BIGINT)) AS total
        |FROM ad
        |WHERE CAST(age AS INT) <= 40 AND gender = 'F' AND CAST(t AS INT) <= 14
        |GROUP BY t""".stripMargin,
      "ad" -> ad)
  }

  test("estimateSeries on a rate-1.0 uniform sample reproduces the exact series") {
    val sample = Uniform(1.0, Seq("impression")).sample(ad)
    val est = Estimator.estimateSeries(sample, task)
    val exact = Estimator.exactSeries(ad, task)
    assert(est.indices.forall(i => math.abs(est(i) - exact(i)) < 1e-6))
  }

  test("estimateSeries from a GSW sample tracks the exact series (5% rate)") {
    val delta = GSW.deltaForRate(ad, col("impression"), 0.05)
    val sample = GSW.optimal(delta, "impression", seed = 2001).sample(ad)
    val est = Estimator.estimateSeries(sample, task)
    val exact = Estimator.exactSeries(ad, task)
    val err = Metrics.relAggError(est, exact)
    assert(err < 0.25, s"mean relative aggregation error $err")
  }

  test("days with no qualifying rows yield 0") {
    val impossible = task.copy(constraint =
      Constraint(Seq(Pred("age", ">", "200", isString = false))))
    val series = Estimator.exactSeries(ad, impossible)
    assert(series.forall(_ == 0.0))
  }

  test("series respects [ts, te] window boundaries") {
    val t2 = task.copy(ts = 5, te = 9)
    val s5 = Estimator.exactSeries(ad, t2)
    val full = Estimator.exactSeries(ad, task)
    assert(s5.length == 5)
    assert(s5.toSeq == full.slice(5, 10).toSeq)
  }

  test("futureTruth covers (te, te+forePeriod]") {
    val t2 = task.copy(ts = 0, te = 12, forePeriod = 7)
    val future = Estimator.futureTruth(ad, t2)
    assert(future.length == 7)
    val direct = Estimator.exactSeries(ad, task.copy(ts = 13, te = 19))
    assert(future.toSeq == direct.toSeq)
  }

  test("Metrics.relAggError on known vectors") {
    assert(Metrics.relAggError(Array(110.0, 90.0), Array(100.0, 100.0)) == 0.1)
    assert(Metrics.relAggError(Array(5.0), Array(5.0)) == 0.0)
    // Zero-truth days are skipped, not divided by.
    assert(Metrics.relAggError(Array(5.0, 110.0), Array(0.0, 100.0)) == 0.1)
    intercept[IllegalArgumentException] {
      Metrics.relAggError(Array(1.0), Array(1.0, 2.0))
    }
  }

  test("Metrics.relIntervalWidth on a known forecast") {
    val fc = repro.forecast.Forecast(Array(100.0), Array(90.0), Array(110.0))
    assert(Metrics.relIntervalWidth(fc, Array(100.0)) == 0.2)
  }
}
