package repro.jobs

import repro.data.ERSynth
import repro.eval._

/** Quick end-to-end sanity run on the smallest data set: prints rule
  * counts, pruning power, F-score, and per-step timings for every method.
  * `spark-submit --class repro.jobs.Smoke` (no Spark needed — core only).
  */
object Smoke {
  def main(args: Array[String]): Unit = {
    val profile = args.headOption.map(ERSynth.byName).getOrElse(ERSynth.Citations)
    val cfg     = ExpConfig(profile, w = 300, maxSteps = 400)
    val b       = Harness.base(profile)
    println(s"dataset=${profile.name} nA=${profile.nA} nB=${profile.nB} truth=${Harness.groundTruth(cfg).size}")
    println(s"rules: CDD=${Harness.rules(profile, cfg.eta, repro.core.UseCDD).size} " +
      s"DD=${Harness.rules(profile, cfg.eta, repro.core.UseDD).size} " +
      s"edit=${Harness.rules(profile, cfg.eta, repro.core.UseEdit).size}")
    // JIT warm-up: run every method once untimed on a short prefix.
    val warm = cfg.copy(maxSteps = 150)
    Method.all.foreach(Harness.run(_, warm))
    Method.all.foreach { m =>
      val t0 = System.nanoTime()
      val r  = Harness.run(m, cfg)
      val el = (System.nanoTime() - t0) / 1e9
      println(f"${m.name}%-8s F=${r.prf.f}%.4f P=${r.prf.precision}%.4f R=${r.prf.recall}%.4f " +
        f"found=${r.found.size}%5d ms/step=${r.stats.msPerStep}%.4f wall=${el}%.1fs " +
        f"[cdd=${r.stats.cddSelectNanos / 1e6}%.0f imp=${r.stats.imputeNanos / 1e6}%.0f er=${r.stats.erNanos / 1e6}%.0f]ms " +
        s"pruning=${r.stats.pruningPower.map { case (k, v) => f"$k=${v * 100}%.2f%%" }.mkString(" ")}")
    }
  }
}
