package repro.eval

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  private def p(a: Long, b: Long): (Long, Long) = (a, b)

  test("perfect match gives F = 1") {
    val s = Set(p(1, 2), p(3, 4))
    assert(Metrics.prf(s, s) == Metrics.PRF(1.0, 1.0, 1.0))
  }

  test("empty found with non-empty truth gives recall 0, F 0") {
    val m = Metrics.prf(Set.empty, Set(p(1, 2)))
    assert(m.recall == 0.0 && m.f == 0.0 && m.precision == 1.0)
  }

  test("half precision, full recall (Eq. 6)") {
    val m = Metrics.prf(Set(p(1, 2), p(3, 4)), Set(p(1, 2)))
    assert(m.precision == 0.5 && m.recall == 1.0)
    assert(math.abs(m.f - 2 * 0.5 * 1.0 / 1.5) < 1e-12)
  }

  test("both empty is vacuous perfection") {
    assert(Metrics.prf(Set.empty, Set.empty).f == 1.0)
  }

  test("F is symmetric in precision/recall") {
    val m1 = Metrics.prf(Set(p(1, 2), p(3, 4)), Set(p(1, 2)))          // P=.5 R=1
    val m2 = Metrics.prf(Set(p(1, 2)), Set(p(1, 2), p(3, 4)))          // P=1 R=.5
    assert(math.abs(m1.f - m2.f) < 1e-12)
  }

  test("DefaultParams match Table 5 defaults") {
    assert(DefaultParams.alpha == 0.5 && DefaultParams.rho == 0.5 && DefaultParams.xi == 0.1)
    assert(DefaultParams.w == 1000 && DefaultParams.eta == 0.3 && DefaultParams.m == 1)
    assert(DefaultParams.alphas == Seq(0.1, 0.2, 0.5, 0.8, 0.9))
    assert(DefaultParams.ws == Seq(500, 800, 1000, 2000, 3000))
  }

  test("ExpConfig.gamma is rho times dimensionality") {
    val c = ExpConfig(repro.data.ERSynth.Citations, rho = 0.6)
    assert(c.gamma == 2.4)
  }

  test("Method lists match §6.1") {
    assert(Method.all.map(_.name) ==
      Seq("TER-iDS", "Ij+GER", "CDD+ER", "DD+ER", "er+ER", "con+ER"))
    assert(Method.effectiveness.map(_.name) == Seq("TER-iDS", "DD+ER", "er+ER", "con+ER"))
  }

  test("Harness.table renders a markdown table") {
    val t = Harness.table(Seq("a", "b"), Seq(Seq("1", "2")))
    assert(t == "| a | b |\n| --- | --- |\n| 1 | 2 |\n")
  }

  test("Harness caches are consistent: same config gives same ground truth") {
    val cfg = ExpConfig(repro.data.ERSynth.Citations, w = 100)
    assert(Harness.groundTruth(cfg) eq Harness.groundTruth(cfg))
  }
}
