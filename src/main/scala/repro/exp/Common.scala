package repro.exp

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel
import repro.SynthData
import repro.core._
import repro.data.AdSchema
import repro.forecast.{ArimaForecaster, Forecaster, LstmForecaster}
import repro.sampling._

/** Shared scaffolding for the evaluation-section experiments (§6).
  *
  * Scale note: the paper runs on ~15 M rows/day. We run at
  * `BenchConfig.sf` of that (default 0.002 ⇒ 30 K rows/day), and scale the
  * SAMPLING RATES up by `rateScale` (default 50×) so that the statistically
  * relevant quantity — in-constraint sample rows per day — matches the
  * paper's regime (paper: 0.1 % of 15 M = 15 K sample rows/day; ours: 5 %
  * of 30 K = 1.5 K/day, with the same ordering behaviour and error shapes).
  * Every bench table prints both the paper-equivalent rate and ours.
  */
final case class BenchConfig(
    sf: Double = sys.env.get("BENCH_SF").map(_.toDouble).getOrElse(0.002),
    trainDays: Int = sys.env.get("BENCH_TRAIN_DAYS").map(_.toInt).getOrElse(150),
    horizon: Int = 7,
    tasksPerPoint: Int = sys.env.get("BENCH_TASKS").map(_.toInt).getOrElse(4),
    rateScale: Double = sys.env.get("BENCH_RATE_SCALE").map(_.toDouble).getOrElse(50.0),
    seed: Long = 7) {

  /** Generated days: training window + forecast horizon + slack. */
  def days: Int = trainDays + horizon + 1

  /** Translate a paper sampling rate into our scaled rate — used by the
    * rate SWEEPS (Exp-IV style), where what matters is a spread of sample
    * sizes from noisy to accurate.
    */
  def scaledRate(paperRate: Double): Double = math.min(0.5, paperRate * rateScale)

  /** Equal-sample-rows mapping — used by single-rate experiments (Table 1):
    * the estimator quality is governed by absolute sample rows per day, so
    * the paper's rate on 15 M rows/day maps to `paperRate / sf` on our
    * 15 M × sf rows/day (capped at 50 %).
    */
  def equivRate(paperRate: Double): Double = math.min(0.5, paperRate / sf)
}

/** A named series source: how one method (Full / PIM / a sampler layer)
  * produces the training series for a task. `spaceRows` is the storage the
  * method needs online (sample rows, or PIM cube rows; 0 ⇒ full data).
  * `close()` releases any cached sample DataFrames the method holds.
  */
final case class SeriesMethod(name: String, spaceRows: Long,
                              estimate: ForecastTask => Array[Double],
                              close: () => Unit = () => ())

object Harness {

  /** Generate + cache the bench relation. */
  def data(spark: SparkSession, cfg: BenchConfig): DataFrame = {
    val df = SynthData.adTraffic(spark, cfg.sf, cfg.days, cfg.seed)
      .persist(StorageLevel.MEMORY_ONLY)
    df.count()
    df
  }

  /** The exact-scan method ("Full" in Table 1). */
  def fullMethod(df: DataFrame): SeriesMethod =
    SeriesMethod("Full", 0L, task => Estimator.exactSeries(df, task))

  /** The PIM baseline (cube over all dimensions). */
  def pimMethod(df: DataFrame): SeriesMethod = {
    val pim = new PIM(df, AdSchema.Measures, AdSchema.Dimensions)
    SeriesMethod("PIM", pim.cubeRows, task => pim.estimateSeries(task))
  }

  /** A uniform-sample method at `rate` (serves all measures from 1 sample). */
  def uniformMethod(df: DataFrame, rate: Double, seed: Long = 104717): SeriesMethod = {
    val s = Uniform(rate, AdSchema.Measures, seed).sample(df)
      .persist(StorageLevel.MEMORY_ONLY)
    SeriesMethod(s"Uniform", s.count(), task => Estimator.estimateSeries(s, task),
      () => { s.unpersist(); () })
  }

  /** One optimal GSW sample PER measure at ≈`rate` each (the space-hungry
    * configuration Exp-V quantifies). Dispatches on the task's measure.
    */
  def optGswMethod(df: DataFrame, rate: Double, seed: Long = 104729,
                   measures: Seq[String] = AdSchema.Measures): SeriesMethod = {
    val perMeasure = measures.map { m =>
      val delta = GSW.deltaForRate(df, col(m), rate)
      val s = GSW.optimal(delta, m, seed).sample(df).persist(StorageLevel.MEMORY_ONLY)
      m -> s
    }.toMap
    val rows = perMeasure.valuesIterator.map(_.count()).sum
    SeriesMethod("Opt-GSW", rows,
      task => Estimator.estimateSeries(perMeasure(task.measure), task),
      () => perMeasure.valuesIterator.foreach(_.unpersist()))
  }

  /** One priority sample PER measure with per-day k ≈ rate × rows/day. */
  def priorityMethod(df: DataFrame, rate: Double, rowsPerDay: Long,
                     seed: Long = 104723,
                     measures: Seq[String] = AdSchema.Measures): SeriesMethod = {
    val k = math.max(2, (rate * rowsPerDay).round.toInt)
    val perMeasure = measures.map { m =>
      m -> Priority(k, m, "t", seed).sample(df).persist(StorageLevel.MEMORY_ONLY)
    }.toMap
    val rows = perMeasure.valuesIterator.map(_.count()).sum
    SeriesMethod("Priority", rows,
      task => Estimator.estimateSeries(perMeasure(task.measure), task),
      () => perMeasure.valuesIterator.foreach(_.unpersist()))
  }

  /** ONE arithmetic compressed GSW sample serving all `measures`. */
  def cGswMethod(df: DataFrame, rate: Double, seed: Long = 104729,
                 measures: Seq[String] = AdSchema.Measures): SeriesMethod = {
    val weight = measures.map(col).reduce(_ + _) / measures.size
    val delta = GSW.deltaForRate(df, weight, rate)
    val s = GSW.arithmetic(delta, measures, seed).sample(df)
      .persist(StorageLevel.MEMORY_ONLY)
    SeriesMethod("C-GSW", s.count(), task => Estimator.estimateSeries(s, task),
      () => { s.unpersist(); () })
  }

  /** ONE geometric compressed GSW sample serving all `measures`. */
  def gGswMethod(df: DataFrame, rate: Double, seed: Long = 104729,
                 measures: Seq[String] = AdSchema.Measures): SeriesMethod = {
    val weight = exp(measures.map(m => log(col(m))).reduce(_ + _) / measures.size)
    val delta = GSW.deltaForRate(df, weight, rate)
    val s = GSW.geometric(delta, measures, seed).sample(df)
      .persist(StorageLevel.MEMORY_ONLY)
    SeriesMethod("G-GSW", s.count(), task => Estimator.estimateSeries(s, task),
      () => { s.unpersist(); () })
  }

  /** Evaluate one method on one task: aggregation error, forecast error and
    * relative interval width under the given forecaster.
    */
  final case class Eval(aggErr: Double, fcErr: Double, intervalWidth: Double)

  def evaluate(method: SeriesMethod, task: ForecastTask,
               exact: Array[Double], truth: Array[Double],
               forecaster: Forecaster, level: Double = 0.9): Eval = {
    val est = method.estimate(task)
    val fc = forecaster.fitForecast(est, task.forePeriod, level)
    Eval(
      aggErr = Metrics.relAggError(est, exact),
      fcErr = Metrics.relForecastError(fc.point, truth),
      intervalWidth = Metrics.relIntervalWidth(fc, truth))
  }

  def arima: Forecaster = ArimaForecaster()
  def lstm: Forecaster = LstmForecaster()

  /** Render a fixed-width table (bench suites print these rows so their
    * output can be diffed against EXPERIMENTS.md).
    */
  def renderTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]): String =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmt(v: Double): String = f"$v%.3f"
}
