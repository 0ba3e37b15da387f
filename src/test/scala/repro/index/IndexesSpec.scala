package repro.index

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.cdd.{Rule, RuleMiner}
import repro.core.{Pivots, Record}
import repro.data.ERSynth
import repro.impute.{Imputer, Repo}
import repro.pivot.PivotSelector

/** CDD-index and DR-index completeness: index-assisted selection must agree
  * with (CDD-index) or over-approximate (DR-index, later verified) the
  * linear-scan ground truth on real mined rules and generated records.
  */
class IndexesSpec extends AnyFunSuite {

  private lazy val base   = ERSynth.generate(ERSynth.Citations)
  private lazy val repo   = new Repo(base.repoPool.take(240))
  private lazy val rules  = RuleMiner.mineCDDs(repo)
  private lazy val pivots = PivotSelector.select(repo)
  private lazy val d      = repo.d
  private lazy val cddIdx = new CDDIndex(rules, pivots, d)
  private lazy val drIdx  = new DRIndex(repo, pivots, base.topicVocab)

  private def randomRecords(n: Int, xi: Double, m: Int): Seq[Record] =
    ERSynth.mask(base, xi, m)._1.take(n)

  test("CDD-index select equals the linear applicable-rule filter") {
    randomRecords(150, xi = 0.6, m = 1).foreach { r =>
      r.missing.foreach { j =>
        val linear = rules.filter(rule => rule.dep == j && rule.applicableTo(r) &&
          rule.det.forall {
            case (x, v: repro.cdd.ValueEq) => repro.core.Text.tokens(r.attrs(x).get) == v.tokens
            case _                         => true
          })
        val indexed = cddIdx.select(r, j)
        assert(indexed.toSet == linear.toSet, s"rid=${r.rid} attr=$j")
      }
    }
  }

  test("CDD-index never selects rules whose determinants are missing in the record") {
    randomRecords(100, xi = 0.9, m = 2).foreach { r =>
      r.missing.foreach { j =>
        cddIdx.select(r, j).foreach(rule => assert(rule.applicableTo(r)))
      }
    }
  }

  test("CDD-index tracks visited leaves") {
    val r = randomRecords(50, xi = 1.0, m = 1).find(_.missing.nonEmpty).get
    cddIdx.select(r, r.missing.head)
    assert(cddIdx.lastLeavesVisited >= 0)
    assert(cddIdx.ruleCount == rules.size)
  }

  test("DR-index finder candidates are a superset of the satisfying samples") {
    val recs = randomRecords(80, xi = 0.8, m = 1).filter(_.missing.nonEmpty)
    assert(recs.nonEmpty)
    recs.foreach { r =>
      val j = r.missing.head
      rules.filter(rule => rule.dep == j && rule.applicableTo(r)).take(6).foreach { rule =>
        val rTok = (x: Int) => r.attrs(x).map(repro.core.Text.tokens).getOrElse(Set.empty[String])
        val satisfying = repo.rows.indices.filter { si =>
          rule.satisfiedBy(rTok, x => repo.tokenRows(si)(x))
        }.toSet
        val candidates = drIdx.finderFor(r)(rule, r).toSet
        assert(satisfying.subsetOf(candidates),
          s"missing=${satisfying -- candidates} rule=$rule rid=${r.rid}")
      }
    }
  }

  test("DR-index-assisted imputation equals linear-scan imputation") {
    val recs = randomRecords(60, xi = 0.7, m = 1).filter(_.missing.nonEmpty)
    recs.foreach { r =>
      val linear  = Imputer.impute(r, rules, repo, Imputer.allSamples(repo))
      val indexed = Imputer.impute(r, rules, repo, drIdx.finderFor(r))
      assert(linear.attrDists == indexed.attrDists, s"rid=${r.rid}")
      assert(linear.instances == indexed.instances)
    }
  }

  test("DR-index prunes at least some leaves for constant-constrained rules") {
    val constRules = rules.filter(_.det.values.exists(_.isInstanceOf[repro.cdd.ValueEq]))
    assert(constRules.nonEmpty)
    val recs  = randomRecords(200, xi = 1.0, m = 1).filter(_.missing.nonEmpty)
    var total = 0
    var visited = 0
    recs.foreach { r =>
      val j = r.missing.head
      constRules.filter(rule => rule.dep == j && rule.applicableTo(r)).take(3).foreach { rule =>
        drIdx.finderFor(r)(rule, r).size
        val full = drIdx.tree.search((_, _) => true, (_, _) => true)(_ => ())
        total += full
        visited += drIdx.lastLeavesVisited
      }
    }
    assert(total > 0 && visited < total, s"visited=$visited of $total leaves — no pruning at all")
  }
}
