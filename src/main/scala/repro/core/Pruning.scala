package repro.core

/** The four pruning strategies of §4 (Theorems 4.1–4.4, Lemmas 4.1–4.3).
  *
  * All bounds are proven upper bounds, so every prune is sound: a pruned
  * pair can never satisfy Inequality (2). Property tests cross-check each
  * bound against brute-force enumeration over all instance pairs.
  */
object Pruning {

  /** Lemma 4.1 per-attribute term: similarity UB from token-set size ranges. */
  def ubSimSizeAttr(aMin: Int, aMax: Int, bMin: Int, bMax: Int): Double =
    if (aMin > bMax && aMin > 0) bMax.toDouble / aMin
    else if (bMin > aMax && bMin > 0) aMax.toDouble / bMin
    else 1.0

  /** Lemma 4.1: `ub_sim(r_i, r_j)` summed over attributes, tuple vs tuple. */
  def ubSimBySize(x: TupleSketch, y: TupleSketch): Double = {
    var s = 0.0
    var k = 0
    while (k < x.d) {
      val (a, b) = (x.attrs(k), y.attrs(k))
      s += ubSimSizeAttr(a.sizeMin, a.sizeMax, b.sizeMin, b.sizeMax)
      k += 1
    }
    s
  }

  /** Lemma 4.2 gap term: min possible |X_k - Y_k| given interval bounds. */
  def minDistGap(lo1: Double, hi1: Double, lo2: Double, hi2: Double): Double =
    if (lo1 > hi2) lo1 - hi2
    else if (lo2 > hi1) lo2 - hi1
    else 0.0

  /** Lemma 4.2: `ub_sim = d - Σ_k min_dist_k` via pivots. Every pivot shared
    * by both sketches on an attribute yields a valid lower bound of the
    * pairwise distance (triangle inequality), so we take the largest gap.
    */
  def ubSimByPivot(x: TupleSketch, y: TupleSketch): Double = {
    var s = 0.0
    var k = 0
    while (k < x.d) {
      val (a, b) = (x.attrs(k), y.attrs(k))
      val nPiv   = math.min(a.distLo.size, b.distLo.size)
      var gap    = 0.0
      var p      = 0
      while (p < nPiv) {
        val g = minDistGap(a.distLo(p), a.distHi(p), b.distLo(p), b.distHi(p))
        if (g > gap) gap = g
        p += 1
      }
      s += 1.0 - gap
      k += 1
    }
    s
  }

  /** Lemma 4.3: Paley–Zygmund-based probability upper bound w.r.t. the main
    * pivot. X/Y are the (random) summed distances of the two imputed tuples
    * to the pivot; E/lb/ub come from the tuple sketches.
    */
  def pzUpperBound(d: Int, gamma: Double,
                   eX: Double, lbX: Double, ubX: Double,
                   eY: Double, lbY: Double, ubY: Double): Double = {
    val dg = d - gamma
    if (lbX >= ubY - 1e-12) {
      val den   = eX - eY
      val range = ubX - lbY
      if (den > 1e-12 && range > 1e-12 && dg >= 0 && dg <= den) {
        val th = dg / den
        1.0 - (1.0 - th) * (1.0 - th) * den / range
      } else 1.0
    } else if (lbY >= ubX - 1e-12) {
      val den   = eY - eX
      val range = ubY - lbX
      if (den > 1e-12 && range > 1e-12 && dg >= 0 && dg <= den) {
        val th = dg / den
        1.0 - (1.0 - th) * (1.0 - th) * den / range
      } else 1.0
    } else 1.0
  }

  /** Theorem 4.3 applied to two sketches via the main pivot (index 0). */
  def probUpperBound(x: TupleSketch, y: TupleSketch, gamma: Double): Double =
    pzUpperBound(x.d, gamma,
      x.eDist(0), x.lbDist(0), x.ubDist(0),
      y.eDist(0), y.lbDist(0), y.ubDist(0))

  /** Refinement outcome: whether the pair matches, whether Theorem 4.4 cut
    * the enumeration short (instance-pair-level prune / early accept), and
    * how many instance pairs were checked.
    */
  final case class Refined(matched: Boolean, earlyStopped: Boolean, pairsChecked: Int, pr: Double)

  /** Exact TER-iDS probability check (Eq. 2) with Theorem 4.4 early
    * termination: stop as soon as the accumulated probability exceeds α
    * (sound accept — remaining terms are non-negative) or the optimistic
    * upper bound `acc + (1 - processedMass)` drops to ≤ α (sound reject).
    */
  def refine(x: ImputedTuple, y: ImputedTuple, k: Set[String], gamma: Double, alpha: Double): Refined = {
    val xi  = x.instances
    val yi  = y.instances
    val xkw = xi.map(_.hasKeyword(k))
    val ykw = yi.map(_.hasKeyword(k))
    val total   = xi.length * yi.length
    var acc     = 0.0
    var mass    = 0.0
    var checked = 0
    var i       = 0
    while (i < xi.length) {
      var j = 0
      while (j < yi.length) {
        val pp = xi(i).p * yi(j).p
        if ((xkw(i) || ykw(j)) && xi(i).sim(yi(j)) > gamma) acc += pp
        mass += pp
        checked += 1
        if (acc > alpha) return Refined(matched = true, earlyStopped = checked < total, checked, acc)
        if (acc + (1.0 - mass) <= alpha)
          // "Early" only if enumeration was actually cut short — a reject on
          // the final instance pair is a full refinement, not a Thm 4.4 prune.
          return Refined(matched = false, earlyStopped = checked < total, checked, acc)
        j += 1
      }
      i += 1
    }
    Refined(acc > alpha, earlyStopped = false, checked, acc)
  }

  /** Naive exact probability (Eq. 2), no early stop — the straightforward
    * method's inner loop, used by the non-indexed baselines. It evaluates
    * the similarity of EVERY instance pair before testing the keyword
    * predicate: exploiting the keyword to skip the similarity would already
    * be Theorem 4.1, which the straightforward method does not have.
    */
  def prExact(x: ImputedTuple, y: ImputedTuple, k: Set[String], gamma: Double): (Double, Int) = {
    var acc     = 0.0
    var checked = 0
    x.instances.foreach { mi =>
      val mikw = mi.hasKeyword(k)
      y.instances.foreach { mj =>
        val s       = mi.sim(mj)
        val topical = mikw || mj.hasKeyword(k)
        if (topical && s > gamma) acc += mi.p * mj.p
        checked += 1
      }
    }
    (acc, checked)
  }
}
