package repro.sampling

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Uniform (Bernoulli) sampling baseline, as used for the sampling variant
  * of [8] and classic online aggregation [29].
  *
  * Every row is kept independently with probability `rate`; the calibrated
  * measure is `m / rate`, the usual inverse-probability rescaling. Its error
  * bound is proportional to the RANGE of the measure (max − min) [29], which
  * is why it degrades badly on our heavy-tailed measures — exactly the
  * effect the paper's Exp-IV shows.
  *
  * @param rate sampling probability in (0, 1]
  * @param ms   measures to carry calibrated estimate columns for
  * @param seed deterministic seed for the Bernoulli draws
  */
final case class Uniform(rate: Double, ms: Seq[String], seed: Long = 104717)
    extends Sampler {
  require(rate > 0 && rate <= 1, s"Uniform: rate=$rate out of (0,1]")

  override def name: String = f"Uniform($rate%.4f)"
  override def measures: Seq[String] = ms

  override def sample(df: DataFrame): DataFrame = {
    val kept = df.filter(rand(seed) < rate)
    ms.foldLeft(kept) { (acc, m) =>
      acc.withColumn(Sampler.estCol(m), col(m) / rate)
    }
  }
}
