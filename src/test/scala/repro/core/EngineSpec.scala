package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.ERSynth
import repro.eval._

/** End-to-end engine semantics: the indexed TER-iDS pipeline must produce
  * exactly the same entity set as the naive straightforward method (all
  * prunes sound), window eviction must follow Def. 2, and the pruning
  * counters must be consistent.
  */
class EngineSpec extends AnyFunSuite {

  private val cfg = ExpConfig(ERSynth.Citations, w = 120, maxSteps = 260)

  private lazy val results: Map[Method, RunResult] =
    Method.all.map(m => m -> Harness.run(m, cfg)).toMap

  test("TER-iDS result set equals the naive CDD+ER result set (prunes are sound)") {
    assert(results(TERiDS).found == results(CddEr).found)
  }

  test("Ij+GER result set equals TER-iDS (index join does not change output)") {
    assert(results(IjGer).found == results(TERiDS).found)
  }

  test("every reported pair crosses two streams (even rid + odd rid)") {
    Method.all.foreach { m =>
      results(m).found.foreach { case (a, b) =>
        assert((a % 2) != (b % 2), s"$m reported same-stream pair ($a,$b)")
      }
    }
  }

  test("every reported pair respects the sliding window (Def. 2)") {
    Method.all.foreach { m =>
      results(m).found.foreach { case (a, b) =>
        assert(math.abs(a / 2 - b / 2) < cfg.w, s"$m pair ($a,$b) outside window")
      }
    }
  }

  test("pruning counters partition the candidate pairs") {
    val s = results(TERiDS).stats
    val accounted = s.prunedKeyword + s.prunedSimUB + s.prunedProbUB +
      s.prunedInstancePair + s.refinedFull + s.matchedPairs
    // matched pairs found via early-accept are counted in matchedPairs;
    // everything else must be one of the four prunes or a full refinement.
    assert(accounted >= s.pairsTotal, s"accounted=$accounted total=${s.pairsTotal}")
    assert(s.pairsTotal > 0)
  }

  test("naive engines never report pruning") {
    Seq(CddEr, DdEr, ErEr, ConEr).foreach { m =>
      val s = results(m).stats
      assert(s.prunedKeyword + s.prunedSimUB + s.prunedProbUB + s.prunedInstancePair == 0)
    }
  }

  test("keyword pruning dominates (Fig. 4 shape)") {
    val p = results(TERiDS).stats.pruningPower
    assert(p("keyword") > 0.5, s"keyword pruning only ${p("keyword")}")
    assert(p.values.sum <= 1.0 + 1e-9)
  }

  test("timers are populated for all phases") {
    val s = results(TERiDS).stats
    assert(s.imputeNanos > 0 && s.erNanos > 0 && s.steps > 0)
    assert(results(ConEr).stats.cddSelectNanos == 0) // con+ER never selects rules
  }

  test("window size never exceeds w") {
    val eng = Harness.engineFor(TERiDS, cfg)
    val b   = Harness.base(cfg.profile)
    val (sa, sb) = ERSynth.mask(b, cfg.xi, cfg.m)
    eng.run(Seq(sa, sb), 200)
    assert(eng.windowSize(0) <= cfg.w && eng.windowSize(1) <= cfg.w)
    assert(eng.windowSize(0) == cfg.w) // 200 > w=120 steps → window full
  }

  test("expired pairs leave the current ES but remain in allMatches") {
    val eng = Harness.engineFor(TERiDS, cfg)
    val b   = Harness.base(cfg.profile)
    val (sa, sb) = ERSynth.mask(b, cfg.xi, cfg.m)
    eng.run(Seq(sa, sb), 260)
    assert(eng.currentES.subsetOf(eng.allMatches))
    eng.currentES.foreach { case (a, bb) =>
      assert(math.abs(a / 2 - bb / 2) < cfg.w)
      // both endpoints still inside the final window
      assert(a / 2 >= 260 - cfg.w && bb / 2 >= 260 - cfg.w)
    }
  }

  test("F-score ordering: rule-based imputation beats con+ER (Fig. 5a shape)") {
    assert(results(TERiDS).prf.f >= results(ConEr).prf.f - 0.02)
  }

  test("identical configurations give identical runs (determinism)") {
    val r1 = Harness.run(TERiDS, cfg)
    val r2 = Harness.run(TERiDS, cfg)
    assert(r1.found == r2.found)
    assert(r1.stats.pairsTotal == r2.stats.pairsTotal)
    assert(r1.stats.prunedKeyword == r2.stats.prunedKeyword)
  }

  test("higher alpha can only shrink the result set") {
    val lo = Harness.run(TERiDS, cfg.copy(alpha = 0.1))
    val hi = Harness.run(TERiDS, cfg.copy(alpha = 0.9))
    assert(hi.found.subsetOf(lo.found))
  }

  test("higher gamma can only shrink the result set") {
    val lo = Harness.run(TERiDS, cfg.copy(rho = 0.4))
    val hi = Harness.run(TERiDS, cfg.copy(rho = 0.7))
    assert(hi.found.subsetOf(lo.found))
  }

  test("larger window can only grow the result set") {
    val small = Harness.run(TERiDS, cfg.copy(w = 60))
    val large = Harness.run(TERiDS, cfg.copy(w = 200))
    assert(small.found.subsetOf(large.found))
  }

  test("zero missing rate makes all methods agree exactly") {
    val c0 = cfg.copy(xi = 0.0)
    val rs = Method.all.map(m => Harness.run(m, c0).found)
    assert(rs.distinct.size == 1)
  }

  test("complete-data run matches the ground truth exactly") {
    val c0 = cfg.copy(xi = 0.0)
    val r  = Harness.run(TERiDS, c0)
    assert(math.abs(r.prf.f - 1.0) < 1e-12, s"P=${r.prf.precision} R=${r.prf.recall}")
  }
}
