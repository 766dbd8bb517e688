package repro

import org.apache.spark.sql.ColumnName

/** SparkSpec plus the `$"col"` interpolator. Suites that need the full
  * `spark.implicits._` (e.g. `Seq(...).toDF`) can bind a stable identifier
  * locally: `val ss = spark; import ss.implicits._`.
  */
trait SparkFunSpec extends SparkSpec {
  protected implicit class StringToCol(sc: StringContext) {
    def $(args: Any*): ColumnName = new ColumnName(sc.s(args: _*))
  }
}
