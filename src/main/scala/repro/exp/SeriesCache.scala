package repro.exp

import org.apache.spark.sql.DataFrame
import repro.core.{Estimator, ForecastTask}
import scala.collection.concurrent.TrieMap

/** Memoizes the expensive exact scans (ground-truth training series and
  * future-truth windows) per task, so experiments that evaluate many
  * methods on the same task only pay for the full-table scan once.
  */
final class SeriesCache(df: DataFrame) {
  private val exactC = TrieMap.empty[(String, String, Int, Int), Array[Double]]
  private val truthC = TrieMap.empty[(String, String, Int, Int), Array[Double]]

  private def key(t: ForecastTask) = (t.measure, t.constraint.sql, t.ts, t.te)

  /** Exact training series `M_ts..M_te` (full scan, cached). */
  def exact(task: ForecastTask): Array[Double] =
    exactC.getOrElseUpdate(key(task), Estimator.exactSeries(df, task))

  /** Exact future series `(te, te+forePeriod]` (full scan, cached). */
  def truth(task: ForecastTask): Array[Double] =
    truthC.getOrElseUpdate(
      (task.measure, task.constraint.sql, task.te, task.forePeriod),
      Estimator.futureTruth(df, task))
}
