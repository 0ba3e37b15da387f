package repro.core

/** Data model for incomplete data streams (Defs. 1–4).
  *
  * A [[Record]] is a raw (possibly incomplete) stream tuple; an
  * [[ImputedTuple]] is its probabilistic imputed version `r^p` whose
  * mutually exclusive [[Instance]]s each carry an existence probability
  * with `Σ p ≤ 1`; a [[TupleSketch]] adds the aggregate values (§5.2) the
  * pruning theorems and the ER-grid need.
  */
final case class Record(rid: Long, sid: Int, ts: Long, attrs: Vector[Option[String]]) {
  def d: Int                 = attrs.size
  def missing: Vector[Int]   = attrs.indices.filter(attrs(_).isEmpty).toVector
  def isComplete: Boolean    = attrs.forall(_.isDefined)
  def apply(j: Int): Option[String] = attrs(j)
}

/** One possible complete world of an imputed tuple, with existence prob. */
final case class Instance(attrs: Vector[String], p: Double) {
  lazy val tokenSets: Vector[Set[String]] = attrs.map(Text.tokens)

  /** ϖ(r_{i,m}, K): does this instance contain at least one query keyword? */
  def hasKeyword(k: Set[String]): Boolean =
    k.nonEmpty && tokenSets.exists(ts => ts.exists(k.contains))

  /** sim(r_{i,m}, r_{j,m'}) — Eq. (1): sum of per-attribute Jaccard sims. */
  def sim(o: Instance): Double = {
    var s = 0.0
    var j = 0
    while (j < attrs.length) { s += Text.jaccard(tokenSets(j), o.tokenSets(j)); j += 1 }
    s
  }
}

/** Imputed (probabilistic) tuple `r^p` (Def. 4).
  *
  * `attrDists(j)` is the per-attribute imputed value distribution (a single
  * `(v, 1.0)` entry for non-missing attributes); `instances` is the
  * (deterministically capped) cross product used for refinement. The
  * per-attribute distributions are exact, so all aggregate bounds derived
  * from them cover every possible instance — capping only affects which
  * instance pairs the refinement enumerates.
  */
final case class ImputedTuple(
    rid: Long,
    sid: Int,
    ts: Long,
    attrDists: Vector[Vector[(String, Double)]],
    instances: Vector[Instance],
) {
  def d: Int = attrDists.size

  /** All keywords (from vocab) that ANY possible value of any attribute
    * contains — used for Theorem 4.1 (prune only if no instance can contain
    * a query keyword).
    */
  def possibleKeywords(vocab: Set[String]): Set[String] = {
    val b = Set.newBuilder[String]
    attrDists.foreach(_.foreach { case (v, _) =>
      Text.tokens(v).foreach(t => if (vocab.contains(t)) b += t)
    })
    b.result()
  }
}

/** Per-attribute aggregates of an imputed tuple (§5.2 cell/tuple aggregates):
  * token-set size interval, and per-pivot Jaccard-distance interval and
  * expectation over the attribute's value distribution. Primitive arrays —
  * this sits on the per-pair hot path of every pruning rule.
  */
final case class AttrSketch(
    sizeMin: Int,
    sizeMax: Int,
    distLo: Array[Double], // per pivot (index 0 = main pivot)
    distHi: Array[Double],
    distE: Array[Double],
)

/** An imputed tuple plus the aggregates every pruning rule reads. `kw` is
  * the set of topic-vocabulary keywords some instance may contain.
  */
final case class TupleSketch(t: ImputedTuple, kw: Set[String], attrs: Vector[AttrSketch]) {
  def rid: Long = t.rid
  def sid: Int  = t.sid
  def ts: Long  = t.ts
  def d: Int    = t.d

  def hasAnyKeyword(k: Set[String]): Boolean = k.exists(kw.contains)

  /** lb/ub/E of X = dist(r, piv_a) summed over attributes (Lemma 4.3). */
  def lbDist(piv: Int): Double = { var s = 0.0; var i = 0; while (i < attrs.length) { s += attrs(i).distLo(piv); i += 1 }; s }
  def ubDist(piv: Int): Double = { var s = 0.0; var i = 0; while (i < attrs.length) { s += attrs(i).distHi(piv); i += 1 }; s }
  def eDist(piv: Int): Double  = { var s = 0.0; var i = 0; while (i < attrs.length) { s += attrs(i).distE(piv); i += 1 }; s }
}

object TupleSketch {

  /** Build the sketch of an imputed tuple against the selected pivots. */
  def of(t: ImputedTuple, pivots: Pivots, vocab: Set[String]): TupleSketch = {
    val attrs = t.attrDists.indices.map { j =>
      val pivTok = pivots.tokenSets(j)
      val nPiv   = pivTok.size
      var szMin  = Int.MaxValue
      var szMax  = 0
      val lo     = Array.fill(nPiv)(Double.MaxValue)
      val hi     = Array.fill(nPiv)(0.0)
      val e      = Array.fill(nPiv)(0.0)
      t.attrDists(j).foreach { case (v, p) =>
        val tk = Text.tokens(v)
        szMin = math.min(szMin, tk.size)
        szMax = math.max(szMax, tk.size)
        var a = 0
        while (a < nPiv) {
          val dd = Text.jdist(tk, pivTok(a))
          if (dd < lo(a)) lo(a) = dd
          if (dd > hi(a)) hi(a) = dd
          e(a) += dd * p
          a += 1
        }
      }
      if (szMin == Int.MaxValue) szMin = 0
      AttrSketch(szMin, szMax, lo, hi, e)
    }.toVector
    TupleSketch(t, t.possibleKeywords(vocab), attrs)
  }
}

/** Selected pivot attribute values (App. B): `perAttr(j).head` is the main
  * pivot for attribute j; the rest are auxiliary pivots.
  */
final case class Pivots(perAttr: Vector[Vector[String]]) {
  val tokenSets: Vector[Vector[Set[String]]] = perAttr.map(_.map(Text.tokens))
  def nPivots(j: Int): Int                   = perAttr(j).size
  def mainTokens(j: Int): Set[String]        = tokenSets(j).head

  /** Convert a raw attribute value to its main-pivot distance coordinate. */
  def coord(j: Int, value: String): Double = Text.jdist(Text.tokens(value), mainTokens(j))
}
