package repro.bench

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.core.TaskGen
import repro.exp.{BenchConfig, Harness, SeriesCache}

/** Shared bench-scale fixtures: generated once per JVM and reused by every
  * bench suite (they run sequentially in one forked JVM). Scale can be
  * overridden with BENCH_SF / BENCH_TRAIN_DAYS / BENCH_TASKS /
  * BENCH_RATE_SCALE.
  */
object BenchFixtures {
  lazy val cfg: BenchConfig = BenchConfig()
  lazy val df: DataFrame = Harness.data(SparkSpec.shared, cfg)
  lazy val gen: TaskGen = new TaskGen(df)
  lazy val cache: SeriesCache = new SeriesCache(df)

  def meanOf(xs: Seq[Double]): Double = xs.sum / xs.size
}
