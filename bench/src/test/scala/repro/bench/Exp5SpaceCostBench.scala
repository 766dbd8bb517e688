package repro.bench

import repro.SparkSpec
import repro.exp.Exp5

/** Reproduces **Figure 16** (Exp-V): space needed by per-measure Opt-GSW
  * samples to match one arithmetic compressed GSW sample's aggregation
  * accuracy. Paper claim: ≈1.8× the space for the same accuracy, with
  * matching forecast errors.
  */
class Exp5SpaceCostBench extends SparkSpec {
  import BenchFixtures._

  test("Exp-V: equal-accuracy space cost of Opt-GSW vs compressed GSW") {
    val res = Exp5.run(df, gen, cache, cfg)
    println(res.rendered)

    assert(res.rows.nonEmpty)
    for (r <- res.rows) {
      // The compressed sample must be cheaper than the 4 matched Opt-GSW
      // samples, but by less than the trivial 4× of equal-rate samples
      // (the paper lands at ~1.8×).
      assert(r.spaceRatio > 1.0,
        f"space ratio ${r.spaceRatio}%.2f should exceed 1 at rate ${r.paperRate}")
      assert(r.spaceRatio < 4.5,
        f"space ratio ${r.spaceRatio}%.2f should stay below the naive 4x")
      // With matched aggregation accuracy, forecast errors should match too.
      assert(r.optFcErr < r.cGswFcErr * 2.5 + 0.1 &&
             r.cGswFcErr < r.optFcErr * 2.5 + 0.1,
        s"forecast errors should be close: opt=${r.optFcErr} c=${r.cGswFcErr}")
    }
  }
}
