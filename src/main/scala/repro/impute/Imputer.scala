package repro.impute

import scala.collection.mutable
import repro.cdd.Rule
import repro.core.{ImputedTuple, Instance, Record, Text}

/** CDD-based imputation of incomplete tuples (§3, Eqs. 3–4), plus the
  * window-based imputer used by the `con+ER` baseline [43].
  *
  * For each missing attribute `A_j`, every applicable rule `X → A_j`
  * contributes, for every repository sample `s` satisfying its determinant
  * constraints w.r.t. `r`, the candidate set `cand(s[A_j])` = domain values
  * within the rule's dependent interval of `s[A_j]`. Candidate frequencies
  * are summed over all rules (Eq. 4) and normalized into existence
  * probabilities.
  *
  * Deviation (documented in DESIGN.md §3.5): the per-attribute distribution
  * keeps the top [[Imputer.MaxValuesPerAttr]] values and the instance cross
  * product keeps the top [[Imputer.MaxInstances]] instances, both in
  * deterministic (-p, value) order, so `Σ p ≤ 1` (Def. 4) holds.
  */
object Imputer {
  val MaxValuesPerAttr = 8
  val MaxInstances     = 16

  /** Candidate sample indices for (rule, record) — the DR-index plugs in
    * here; the naive engines pass every index. The imputer re-verifies each
    * candidate, so finders may return false positives but must not miss any
    * truly satisfying sample.
    */
  type SampleFinder = (Rule, Record) => Iterator[Int]

  def allSamples(repo: Repo): SampleFinder = (_, _) => repo.rows.indices.iterator

  private def recordTokens(r: Record): Int => Set[String] = {
    val ts = r.attrs.map(_.map(Text.tokens).getOrElse(Set.empty[String]))
    j => ts(j)
  }

  /** Imputed value distribution for missing attribute j of r (Eq. 4).
    * `cached = false` recomputes every `cand(s[A_j])` domain scan — the
    * straightforward method's behavior (the memo table is part of our
    * index/synopsis infrastructure, withheld from the naive baselines).
    */
  def valueDistribution(r: Record, j: Int, rules: Seq[Rule], repo: Repo,
                        finder: SampleFinder, cached: Boolean = true): Vector[(String, Double)] = {
    val rTok = recordTokens(r)
    val freq = new Array[Long](repo.doms(j).size) // Eq. 4 multiset over dom(A_j)
    rules.iterator.filter(rule => rule.dep == j && rule.applicableTo(r)).foreach { rule =>
      finder(rule, r).foreach { si =>
        val sTok = repo.tokenRows(si)
        if (rule.satisfiedBy(rTok, x => sTok(x))) {
          if (rule.depHi <= 1e-12) {
            // Editing-rule semantics: copy the sample's dependent value.
            freq(repo.domIndex(j)(repo.rows(si)(j))) += 1L
          } else {
            val cand =
              if (cached) repo.candidates(j, repo.rows(si)(j), rule.depLo, rule.depHi)
              else repo.candidatesUncached(j, repo.rows(si)(j), rule.depLo, rule.depHi)
            var c = 0
            while (c < cand.length) { freq(cand(c)) += 1L; c += 1 }
          }
        }
      }
    }
    normalize(freq, repo, r.rid, j)
  }

  /** When no rule/sample can impute an attribute, the paper's tuple simply
    * has no usable value there. A unique per-(tuple, attribute) sentinel
    * token keeps that semantics: it matches nothing (two failed imputations
    * must not look identical, which empty strings would — `J(∅,∅)=1`).
    */
  def missSentinel(rid: Long, j: Int): String = s"xmiss${rid}a$j"

  private def normalize(freq: Array[Long], repo: Repo, rid: Long, j: Int): Vector[(String, Double)] = {
    var total = 0L
    var i     = 0
    while (i < freq.length) { total += freq(i); i += 1 }
    if (total == 0L) Vector((missSentinel(rid, j), 1.0))
    else {
      val b = Vector.newBuilder[(String, Double)]
      i = 0
      while (i < freq.length) {
        if (freq(i) > 0) b += ((repo.doms(j)(i), freq(i).toDouble / total))
        i += 1
      }
      b.result()
        .sortBy { case (v, p) => (-p, v) }
        .take(MaxValuesPerAttr)
    }
  }

  /** Cross product of per-attribute distributions, capped deterministically. */
  def assembleInstances(attrDists: Vector[Vector[(String, Double)]]): Vector[Instance] = {
    var combos: Vector[(Vector[String], Double)] = Vector((Vector.empty, 1.0))
    attrDists.foreach { dist =>
      combos = for ((pre, p) <- combos; (v, vp) <- dist) yield (pre :+ v, p * vp)
      // Keep the cap bounded between attributes too; sound because we only
      // ever drop (never re-weight) instances, preserving Σp ≤ 1.
      if (combos.size > MaxInstances * MaxValuesPerAttr)
        combos = combos.sortBy { case (vs, p) => (-p, vs.mkString("")) }.take(MaxInstances * MaxValuesPerAttr)
    }
    combos
      .sortBy { case (vs, p) => (-p, vs.mkString("")) }
      .take(MaxInstances)
      .map { case (vs, p) => Instance(vs, p) }
  }

  /** Full imputation of a record using the given rules and sample finder. */
  def impute(r: Record, rules: Seq[Rule], repo: Repo, finder: SampleFinder): ImputedTuple = {
    val dists = r.attrs.indices.map { j =>
      r.attrs(j) match {
        case Some(v) => Vector((v, 1.0))
        case None    => valueDistribution(r, j, rules, repo, finder)
      }
    }.toVector
    ImputedTuple(r.rid, r.sid, r.ts, dists, assembleInstances(dists))
  }

  /** A complete record is its own single-instance imputed tuple. */
  def imputeComplete(r: Record): ImputedTuple = {
    require(r.isComplete, s"record ${r.rid} has missing attributes")
    val dists = r.attrs.map(v => Vector((v.get, 1.0)))
    ImputedTuple(r.rid, r.sid, r.ts, dists, Vector(Instance(r.attrs.map(_.get), 1.0)))
  }

  /** `con+ER` imputation [43]: the cited constraint-based cleaner repairs a
    * value from its *sequential* neighbors under distance constraints; on
    * textual streams that amounts to copying from the most recent complete
    * tuple of the same stream — no repository access and, per the paper's
    * observation, no semantic association between attribute values (hence
    * its constant cost and worst accuracy in Fig. 5).
    */
  def imputeFromWindow(r: Record, windowComplete: Iterable[(Long, Vector[String])]): ImputedTuple = {
    var best: Vector[String] = null
    var bestTs               = Long.MinValue
    windowComplete.foreach { case (ts, cand) =>
      if (ts >= bestTs) { bestTs = ts; best = cand }
    }
    val dists = r.attrs.indices.map { j =>
      r.attrs(j) match {
        case Some(v)              => Vector((v, 1.0))
        case None if best != null => Vector((best(j), 1.0))
        case None                 => Vector((missSentinel(r.rid, j), 1.0))
      }
    }.toVector
    ImputedTuple(r.rid, r.sid, r.ts, dists, assembleInstances(dists))
  }
}
