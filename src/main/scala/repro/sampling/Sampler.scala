package repro.sampling

import org.apache.spark.sql.DataFrame

/** A sampler turns the full time-series relation into a (much smaller)
  * sample relation from which constrained subset sums can be estimated.
  *
  * Contract: the output of [[sample]] keeps every dimension column and the
  * time column of the input, and adds one column `est_<m>` per supported
  * measure `m` (see [[Sampler.estCol]]) such that for ANY subset of rows
  * `R` selected by a predicate over dimensions and time,
  * `SUM(est_<m>) over (sample ∩ R)` is an unbiased estimator of
  * `SUM(m) over (full ∩ R)`. That property is what lets the online
  * estimator push the task constraint straight down onto the sample with a
  * plain Spark SQL aggregation — the offline sampler never sees the
  * constraint (paper §4, "the sampling algorithm should be independent
  * of C").
  */
trait Sampler {

  /** Human-readable name used in bench tables (e.g. "Opt-GSW(impression)"). */
  def name: String

  /** Measures for which the sample carries calibrated estimate columns. */
  def measures: Seq[String]

  /** Draw the sample. Deterministic in the sampler's seed. */
  def sample(df: DataFrame): DataFrame
}

object Sampler {

  /** Column carrying the calibrated (Horvitz–Thompson) contribution of a
    * sampled row to estimates of `SUM(measure)`.
    */
  def estCol(measure: String): String = s"est_$measure"
}
