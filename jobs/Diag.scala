package repro.jobs

import repro.core._
import repro.exp._

/** Diagnostic: per-constraint PIM aggregation bias vs sampler noise —
  * used to calibrate the bench scale; not part of the reproduction tables.
  */
object DiagPim {
  def main(args: Array[String]): Unit = {
    val (spark, cfg, df, gen, cache) = JobEnv.init("flashp-diag")
    val te = cfg.trainDays - 1
    val pim = Harness.pimMethod(df)
    val opt = Harness.optGswMethod(df, cfg.scaledRate(0.001))
    for (sel <- Seq(0.005, 0.02, 0.05, 0.10)) {
      val tasks = gen.tasks(sel, 4, 0, te, forePeriod = cfg.horizon)
      for (t <- tasks) {
        val exact = cache.exact(t)
        val pimErr = Metrics.relAggError(pim.estimate(t), exact)
        val optErr = Metrics.relAggError(opt.estimate(t), exact)
        println(f"sel=$sel%.3f m=${t.measure}%-10s pimAgg=$pimErr%.3f optAgg=$optErr%.3f  C: ${t.constraint.sql}")
      }
    }
    spark.stop()
  }
}
