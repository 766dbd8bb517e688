package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.data.AdSchema
import scala.util.Random

/** Workload generator for the evaluation (§6): "forecasting tasks are
  * randomly picked with different measures and different combinations of
  * dimensions in their constraints, with some (approximately) fixed
  * selectivity".
  *
  * We enumerate a pool of random conjunctive constraints over the ad-schema
  * dimensions, measure the row selectivity of the WHOLE pool in a single
  * Spark pass (one conditional-count aggregate per candidate), and then
  * serve constraints whose selectivity lands in a band around the requested
  * target. Deterministic in the seed.
  */
final class TaskGen(full: DataFrame, seed: Long = 101, poolSize: Int = 240) {

  private val rng = new Random(seed)

  /** The candidate pool: 2–3 predicates over distinct dimensions — the
    * paper's tasks slice on *combinations* of attributes (e.g. Age AND
    * Gender), which is also what separates the sampling estimators from
    * PIM (single-dimension constraints are PIM-exact by construction).
    */
  val pool: Seq[Constraint] = {
    val atoms: Seq[() => Pred] = Seq(
      () => Pred("age", "<=", (20 + rng.nextInt(58)).toString, isString = false),
      () => Pred("age", ">=", (20 + rng.nextInt(58)).toString, isString = false),
      () => Pred("gender", "=", if (rng.nextBoolean()) "F" else "M", isString = true),
      () => Pred("device", "=", Seq("mobile", "pc", "tablet")(rng.nextInt(3)), isString = true),
      () => Pred("occupation", "=", rng.nextInt(10).toString, isString = false),
      () => Pred("city", "<=", rng.nextInt(50).toString, isString = false),
      () => Pred("city", "=", rng.nextInt(50).toString, isString = false),
      () => Pred("tag_sports", "=", "1", isString = false),
      () => Pred("tag_cartoon", "=", "1", isString = false),
      () => Pred("tag_fashion", "=", "1", isString = false),
      () => Pred("tag_tech", "=", "1", isString = false),
      () => Pred("tag_travel", "=", "1", isString = false),
      () => Pred("tag_food", "=", "1", isString = false),
    )
    (0 until poolSize).map { _ =>
      val want = 2 + rng.nextInt(2)
      val chosen = scala.collection.mutable.ArrayBuffer.empty[Pred]
      val it = rng.shuffle(atoms).iterator
      while (chosen.size < want && it.hasNext) {
        val p = it.next().apply()
        if (!chosen.exists(_.dim == p.dim)) chosen += p
      }
      Constraint(chosen.sortBy(_.dim).toSeq)
    }.distinct
  }

  /** Row selectivity of every pool constraint, one Spark pass. */
  val selectivity: Map[Constraint, Double] = {
    val n = full.count().toDouble
    val aggs = pool.zipWithIndex.map { case (c, i) =>
      sum(when(c.column, 1L).otherwise(0L)) as s"c$i"
    }
    val row = full.select(aggs: _*).head
    pool.zipWithIndex.map { case (c, i) => c -> row.getLong(i) / n }.toMap
  }

  /** Constraints whose selectivity is within [lo, hi] (fractions of rows). */
  def withSelectivity(lo: Double, hi: Double): Seq[Constraint] =
    pool.filter(c => selectivity(c) >= lo && selectivity(c) <= hi)

  /** `count` tasks near `target` selectivity (within ×/÷ `slack`), cycling
    * through qualifying constraints and round-robining measures.
    *
    * @throws IllegalStateException if no pool constraint qualifies.
    */
  def tasks(target: Double, count: Int, ts: Int, te: Int,
            measures: Seq[String] = AdSchema.Measures, model: String = "arima",
            forePeriod: Int = 7, slack: Double = 2.0): Seq[ForecastTask] = {
    val qualifying = withSelectivity(target / slack, target * slack)
    if (qualifying.isEmpty)
      throw new IllegalStateException(
        f"no candidate constraint with selectivity ≈ $target%.4f (slack ×$slack)")
    (0 until count).map { i =>
      ForecastTask(measures(i % measures.size), "ad", qualifying(i % qualifying.size),
        ts, te, model, forePeriod)
    }
  }
}
