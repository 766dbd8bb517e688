package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkFunSpec, SynthData, TestData}

class AdDataSpec extends SparkFunSpec {

  private lazy val ad = TestData.ad

  test("schema: exactly t + 11 dimensions + 4 measures") {
    val expected = (AdSchema.TimeCol +: AdSchema.Dimensions) ++ AdSchema.Measures
    assert(ad.columns.toSeq == expected)
  }

  test("row count: 20 days x 1500 rows/day at SF=1e-4") {
    assert(ad.count() == 20L * 1500L)
  }

  test("every day has the same number of rows") {
    val counts = ad.groupBy("t").count().collect().map(_.getLong(1)).toSet
    assert(counts == Set(1500L))
  }

  test("time stamps are contiguous 0..days-1") {
    val days = ad.select("t").distinct().collect().map(_.getInt(0)).sorted
    assert(days.toSeq == (0 until 20))
  }

  test("all measures are positive integers (weighted samplers need w > 0)") {
    for (m <- AdSchema.Measures) {
      val minV = ad.agg(min(col(m))).head.getLong(0)
      assert(minV >= 1L, s"$m has non-positive values")
    }
  }

  test("measures are heavy-tailed: max/mean ratio is large for impression") {
    val r = ad.agg(max($"impression").cast("double") as "mx",
                   avg($"impression") as "mu").head
    assert(r.getDouble(0) / r.getDouble(1) > 10.0,
      "impression should be heavy-tailed so uniform sampling suffers")
  }

  test("click is trend-correlated with impression (small trend deviation)") {
    // click/impression per row stays within the generator's [0.05, 0.15]
    // band (plus rounding slack at small values).
    val r = ad.select(max($"click".cast("double") / $"impression") as "hi").head
    assert(r.getDouble(0) <= 1.5)
  }

  test("dimension domains are as designed") {
    assert(ad.select("gender").distinct().collect().map(_.getString(0)).toSet == Set("F", "M"))
    assert(ad.select("device").distinct().count() == 3)
    val ages = ad.select(min($"age"), max($"age")).head
    assert(ages.getInt(0) >= 18 && ages.getInt(1) <= 78)
    val occs = ad.select("occupation").distinct().collect().map(_.getInt(0)).toSet
    assert(occs.subsetOf((0 to 9).toSet))
    val tags = ad.select("tag_sports").distinct().collect().map(_.getInt(0)).toSet
    assert(tags.subsetOf(Set(0, 1)))
  }

  test("dimensions are cross-correlated: young users skew mobile") {
    val mobileShare = ad.groupBy($"age" < 35 as "young")
      .agg(avg(($"device" === "mobile").cast("double")) as "share")
      .collect().map(r => r.getBoolean(0) -> r.getDouble(1)).toMap
    assert(mobileShare(true) > mobileShare(false) + 0.2,
      s"expected mobile share gap, got $mobileShare")
  }

  test("measure intensity depends on dimensions (PIM's assumption violated)") {
    val byYoung = ad.groupBy($"age" < 35 as "young")
      .agg(avg($"impression") as "imp").collect()
      .map(r => r.getBoolean(0) -> r.getDouble(1)).toMap
    assert(byYoung(true) > byYoung(false) * 1.2)
  }

  test("daily impression totals show weekly seasonality (not constant)") {
    val totals = ad.groupBy("t").agg(sum($"impression") as "s")
      .collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    val series = (0 until 20).map(totals)
    assert(series.max.toDouble / series.min > 1.2, "daily totals too flat to forecast")
  }

  test("generator is deterministic in (sf, days, seed)") {
    val again = SynthData.adTraffic(spark, sf = 1e-4, days = 20)
    val a = ad.agg(sum($"impression"), sum($"favorite"), sum($"cart")).head
    val b = again.agg(sum($"impression"), sum($"favorite"), sum($"cart")).head
    assert(a == b)
  }

  test("different seed changes the draw") {
    val other = SynthData.adTraffic(spark, sf = 1e-4, days = 20, seed = 99)
    val a = ad.agg(sum($"impression")).head.getLong(0)
    val b = other.agg(sum($"impression")).head.getLong(0)
    assert(a != b)
  }

  test("oracle: per-day SUM(impression) under a constraint matches DuckDB") {
    val sparkDf = ad.filter($"age" <= 30 && $"gender" === "F")
      .groupBy("t").agg(sum($"impression") as "total")
      .select($"t".cast("string") as "t", $"total")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT t, SUM(CAST(impression AS BIGINT)) AS total
        |FROM ad WHERE CAST(age AS INT) <= 30 AND gender = 'F'
        |GROUP BY t""".stripMargin,
      "ad" -> ad)
  }

  test("oracle: multi-measure totals match DuckDB") {
    val sparkDf = ad.agg(
      sum($"favorite") as "f", sum($"impression") as "i",
      sum($"click") as "c", sum($"cart") as "ca")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT SUM(CAST(favorite AS BIGINT)) AS f, SUM(CAST(impression AS BIGINT)) AS i,
        |       SUM(CAST(click AS BIGINT)) AS c, SUM(CAST(cart AS BIGINT)) AS ca
        |FROM ad""".stripMargin,
      "ad" -> ad)
  }
}
