package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.ERSynth
import repro.eval._

/** Parameter sweeps (Figs. 7–10 and App. C.3/C.4 Figs. 13–17). Deterministic
  * assertions target result-set monotonicity and ordering shapes; raw
  * timings are printed for EXPERIMENTS.md.
  */
class F7_Alpha extends AnyFunSuite {
  test("Fig. 7: time vs probabilistic threshold α") {
    val (md, _) = Tables.fig7()
    println(s"\n=== Fig. 7: ms/timestamp vs α (paper: cost decreases as α grows; " +
      s"TER-iDS lowest, 0.0008~0.0175 s) ===\n$md")
    // Result sets shrink monotonically in α (deterministic shape behind the figure).
    ERSynth.All.take(2).foreach { p =>
      val found = DefaultParams.alphas.map(a =>
        Tables.run(TERiDS, ExpConfig(p, alpha = a, maxSteps = Tables.sweepSteps)).found)
      found.sliding(2).foreach { case Seq(lo, hi) => assert(hi.subsetOf(lo)) }
    }
  }
}

class F8_Rho extends AnyFunSuite {
  test("Fig. 8: time vs similarity-threshold ratio ρ") {
    val (md, _) = Tables.fig8()
    println(s"\n=== Fig. 8: ms/timestamp vs ρ=γ/d (paper: cost decreases smoothly with ρ; " +
      s"TER-iDS lowest, 0.0007~0.007 s) ===\n$md")
    ERSynth.All.take(2).foreach { p =>
      val found = DefaultParams.rhos.map(r =>
        Tables.run(TERiDS, ExpConfig(p, rho = r, maxSteps = Tables.sweepSteps)).found)
      found.sliding(2).foreach { case Seq(lo, hi) => assert(hi.subsetOf(lo)) }
    }
  }
}

class F9_Xi extends AnyFunSuite {
  test("Fig. 9: time vs missing rate ξ") {
    val (md, res) = Tables.fig9()
    println(s"\n=== Fig. 9: ms/timestamp vs ξ (paper: cost increases with ξ for all methods; " +
      s"TER-iDS lowest, 0.0013~0.073 s) ===\n$md")
    // More missing data must cost more for the imputing methods (loose 2x slack
    // between the extremes to absorb timing noise).
    ERSynth.All.foreach { p =>
      val t01 = res((p.name, CddEr, 0.1))
      val t08 = res((p.name, CddEr, 0.8))
      assert(t08 > t01 / 2, s"${p.name}: ξ=0.8 (${t08}) unexpectedly cheaper than ξ=0.1 ($t01)")
    }
  }
}

class F10_Window extends AnyFunSuite {
  test("Fig. 10: time vs sliding-window size w") {
    val (md, _) = Tables.fig10()
    println(s"\n=== Fig. 10: ms/timestamp vs w (paper: cost increases with w for all methods; " +
      s"TER-iDS lowest, 0.0006~0.0093 s) ===\n$md")
    // Larger windows can only grow the result set.
    ERSynth.All.take(2).foreach { p =>
      val found = DefaultParams.ws.map(w =>
        Tables.run(TERiDS, ExpConfig(p, w = w, maxSteps = Tables.sweepSteps)).found)
      found.sliding(2).foreach { case Seq(small, large) => assert(small.subsetOf(large)) }
    }
  }
}

class F13_XiEffectiveness extends AnyFunSuite {
  test("Fig. 13: F-score vs missing rate ξ (App. C.3)") {
    val (md, res) = Tables.fig13()
    println(s"\n=== Fig. 13: F-score vs ξ (paper: accuracy decreases with ξ; TER-iDS highest, " +
      s"88.73~97.34%) ===\n$md")
    ERSynth.All.foreach { p =>
      val f = (m: Method, v: Double) => res((p.name, m, v))
      assert(f(TERiDS, 0.1) >= f(TERiDS, 0.8) - 0.02, s"${p.name}: F did not degrade with ξ")
      DefaultParams.xis.foreach(v =>
        assert(f(TERiDS, v) >= f(ConEr, v) - 0.05, s"${p.name} ξ=$v: con+ER beat TER-iDS"))
    }
  }
}

class F14_EtaEffectiveness extends AnyFunSuite {
  test("Fig. 14: F-score vs repository size ratio η (App. C.3)") {
    val (md, res) = Tables.fig14()
    println(s"\n=== Fig. 14: F-score vs η (paper: accuracy increases with η except con+ER " +
      s"constant; TER-iDS highest, 87.51~98.87%) ===\n$md")
    ERSynth.All.foreach { p =>
      val f  = (m: Method, v: Double) => res((p.name, m, v))
      // con+ER ignores the repository: constant accuracy across η.
      DefaultParams.etas.sliding(2).foreach { case Seq(a, b) =>
        assert(math.abs(f(ConEr, a) - f(ConEr, b)) < 1e-9, s"${p.name}: con+ER varies with η")
      }
      assert(f(TERiDS, 0.5) >= f(TERiDS, 0.1) - 0.02, s"${p.name}: F did not improve with η")
    }
  }
}

class F15_MEffectiveness extends AnyFunSuite {
  test("Fig. 15: F-score vs number of missing attributes m (App. C.3)") {
    val (md, res) = Tables.fig15()
    println(s"\n=== Fig. 15: F-score vs m (paper: accuracy decreases with m; TER-iDS highest, " +
      s"89.26~97.34%) ===\n$md")
    ERSynth.All.foreach { p =>
      val f = (m: Method, v: Double) => res((p.name, m, v))
      assert(f(TERiDS, 1.0) >= f(TERiDS, 3.0) - 0.02, s"${p.name}: F did not degrade with m")
    }
  }
}

class F16_EtaEfficiency extends AnyFunSuite {
  test("Fig. 16: time vs repository size ratio η (App. C.4)") {
    val (md, res) = Tables.fig16()
    println(s"\n=== Fig. 16: ms/timestamp vs η (paper: cost grows with η except con+ER " +
      s"constant; TER-iDS lowest, 0.0004~0.01 s) ===\n$md")
    // con+ER never touches the repository → its result sets are η-invariant.
    ERSynth.All.take(2).foreach { p =>
      val found = DefaultParams.etas.map(e =>
        Tables.run(ConEr, ExpConfig(p, eta = e, maxSteps = Tables.sweepSteps)).found)
      assert(found.distinct.size == 1, s"${p.name}: con+ER results vary with η")
    }
  }
}

class F17_MEfficiency extends AnyFunSuite {
  test("Fig. 17: time vs number of missing attributes m (App. C.4)") {
    val (md, res) = Tables.fig17()
    println(s"\n=== Fig. 17: ms/timestamp vs m (paper: cost increases with m except con+ER " +
      s"insensitive; TER-iDS lowest, 0.0013~0.0635 s) ===\n$md")
    ERSynth.All.foreach { p =>
      val t1 = res((p.name, CddEr, 1.0))
      val t3 = res((p.name, CddEr, 3.0))
      assert(t3 > t1 / 2, s"${p.name}: m=3 ($t3) unexpectedly cheaper than m=1 ($t1)")
    }
  }
}
