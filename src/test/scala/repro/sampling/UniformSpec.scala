package repro.sampling

import org.apache.spark.sql.functions._
import repro.{LocalSampling, SparkFunSpec, TestData}
import scala.util.Random

/** Tests for the uniform-sampling baseline: rescaling, rate, unbiasedness,
  * and the range-dependence of its error that motivates weighted sampling
  * (§4, [29]).
  */
class UniformSpec extends SparkFunSpec {

  private lazy val ad = TestData.ad

  test("est column is m/rate on every kept row") {
    val s = Uniform(0.05, Seq("impression", "click")).sample(ad)
    val bad = s.filter(
      abs(col(Sampler.estCol("impression")) - col("impression") / 0.05) > 1e-9 ||
        abs(col(Sampler.estCol("click")) - col("click") / 0.05) > 1e-9)
    assert(bad.count() == 0)
  }

  test("sample size concentrates around rate × n") {
    val rate = 0.05
    val n = ad.count()
    val size = Uniform(rate, Seq("impression")).sample(ad).count()
    val expected = rate * n
    assert(math.abs(size - expected) < 5 * math.sqrt(expected),
      s"size $size vs expected $expected")
  }

  test("rate of 1 keeps every row") {
    assert(Uniform(1.0, Seq("impression"), seed = 1).sample(ad).count() == ad.count())
  }

  test("invalid rates rejected") {
    intercept[IllegalArgumentException] { Uniform(0.0, Seq("impression")) }
    intercept[IllegalArgumentException] { Uniform(1.5, Seq("impression")) }
  }

  test("deterministic in the seed") {
    val a = Uniform(0.05, Seq("impression"), seed = 2).sample(ad).count()
    val b = Uniform(0.05, Seq("impression"), seed = 2).sample(ad).count()
    assert(a == b)
  }

  test("unbiasedness (MC, 600 trials)") {
    val m = TestData.measuresLocal("impression")
    val truth = m.sum
    val rng = new Random(31)
    val est = (1 to 600).map(_ => LocalSampling.uniformTrial(m, 0.01, rng)._1)
    val mean = est.sum / est.size
    val se = math.sqrt(est.map(e => (e - mean) * (e - mean)).sum / (est.size - 1)) /
      math.sqrt(est.size.toDouble)
    assert(math.abs(mean - truth) < 4 * se, s"biased: $mean vs $truth")
  }

  test("on heavy-tailed measures uniform is markedly worse than optimal GSW (MC)") {
    val m = TestData.measuresLocal("impression")
    val rate = 0.01
    val delta = m.sum / (rate * m.length)
    val rng = new Random(32)
    val uni = (1 to 400).map(_ => LocalSampling.uniformTrial(m, rate, rng)._1)
    val gsw = (1 to 400).map(_ => LocalSampling.gswTrial(m, m, delta, rng)._1)
    val ru = LocalSampling.rstd(uni, m.sum)
    val rg = LocalSampling.rstd(gsw, m.sum)
    assert(ru > rg * 1.5,
      s"expected uniform RSTD ($ru) to clearly exceed optimal GSW's ($rg) on heavy tails")
  }

  test("uniform error tracks the measure's range: clipping the tail helps (MC)") {
    val m = TestData.measuresLocal("impression")
    val clipped = m.map(v => math.min(v, 50.0))
    val rng = new Random(33)
    val raw = (1 to 400).map(_ => LocalSampling.uniformTrial(m, 0.01, rng)._1)
    val clip = (1 to 400).map(_ => LocalSampling.uniformTrial(clipped, 0.01, rng)._1)
    val rRaw = LocalSampling.rstd(raw, m.sum)
    val rClip = LocalSampling.rstd(clip, clipped.sum)
    assert(rClip < rRaw,
      s"uniform RSTD should shrink when the range shrinks ($rClip vs $rRaw)")
  }
}
