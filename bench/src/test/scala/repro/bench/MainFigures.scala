package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.ERSynth
import repro.eval._

/** Benchmarks for the headline evaluation (Table 4, Figs. 4–6). Each suite
  * prints the reproduced table (collected into EXPERIMENTS.md) and asserts
  * the paper's qualitative shape.
  */
class T4_Datasets extends AnyFunSuite {
  test("Table 4: data set statistics") {
    val (md, rows) = Tables.table4()
    println(s"\n=== Table 4: data sets (paper: Citations 2614/2294/2224, Anime 4000/4000/10704, " +
      s"Bikes 4786/9003/13815, EBooks 6500/14112/16719, Songs 1M/1M/1.29M) ===\n$md")
    // Scaled-down shape: every set non-trivial, Anime/Bikes/EBooks multi-match.
    rows.foreach(r => assert(r.matches > 0, s"${r.name} has no ground-truth matches"))
    assert(rows.map(_.name) == Seq("Citations", "Anime", "Bikes", "EBooks", "Songs"))
    assert(rows.last.nA == 2000) // Songs is the largest set
  }
}

class F4_PruningPower extends AnyFunSuite {
  test("Fig. 4: pruning power of the four strategies") {
    val (md, per) = Tables.fig4()
    println(s"\n=== Fig. 4: pruning power (paper: keyword 77.51~86.51%, simUB 5.59~14.23%, " +
      s"probUB 2.15~3.64%, instancePair 1.54~4.35%, total 98.32~99.43%) ===\n$md")
    per.foreach { case (ds, m) =>
      assert(m("keyword") > 0.5, s"$ds keyword pruning ${m("keyword")}")
      assert(m("keyword") > m("probUB"), s"$ds ordering")
      assert(m.values.sum <= 1.0 + 1e-9)
    }
  }
}

class F5a_Effectiveness extends AnyFunSuite {
  test("Fig. 5(a): F-score vs data sets") {
    val (md, res) = Tables.fig5a()
    println(s"\n=== Fig. 5(a): F-score (paper: TER-iDS highest, 94.62~97.34%; then DD+ER, " +
      s"er+ER, con+ER worst) ===\n$md")
    ERSynth.All.foreach { p =>
      val f = (m: Method) => res((p.name, m)).f
      assert(f(TERiDS) >= 0.80, s"${p.name} TER-iDS F ${f(TERiDS)}")
      assert(f(TERiDS) >= f(ConEr) - 1e-9, s"${p.name}: con+ER beat TER-iDS")
      assert(f(TERiDS) >= f(ErEr) - 0.02, s"${p.name}: er+ER beat TER-iDS by > 2pts")
    }
  }
}

class F5b_Efficiency extends AnyFunSuite {
  test("Fig. 5(b): wall-clock time vs data sets") {
    val (md, res) = Tables.fig5b()
    println(s"\n=== Fig. 5(b): ms/timestamp (paper: TER-iDS fastest, then Ij+GER, con+ER; " +
      s"CDD/DD/er+ER 1-4 orders slower; DD+ER slowest; EBooks the most expensive set) ===\n$md")
    // Aggregate ordering across data sets (single-run timings are noisy per set).
    def tot(m: Method) = ERSynth.All.map(p => res((p.name, m))).sum
    assert(tot(TERiDS) < tot(CddEr), "TER-iDS not faster than CDD+ER overall")
    assert(tot(TERiDS) < tot(DdEr), "TER-iDS not faster than DD+ER overall")
    assert(tot(IjGer) < tot(CddEr), "Ij+GER not faster than CDD+ER overall")
    assert(tot(TERiDS) < 2 * tot(IjGer) + 1e-9, "TER-iDS far slower than Ij+GER")
  }
}

class F6_Breakup extends AnyFunSuite {
  test("Fig. 6: break-up cost of TER-iDS") {
    val (md, res) = Tables.fig6()
    println(s"\n=== Fig. 6: break-up cost (paper: ER dominates except on Songs, where " +
      s"CDD-selection/imputation over the large R grows) ===\n$md")
    res.foreach { case (ds, (c, i, e)) =>
      assert(c >= 0 && i >= 0 && e >= 0, s"$ds negative phase cost")
      assert(c + i + e > 0, s"$ds zero total")
    }
  }
}
