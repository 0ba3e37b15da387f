package repro.pivot

import scala.collection.mutable
import scala.util.Random
import repro.core.{Pivots, Text}
import repro.impute.Repo

/** Cost-model-based pivot tuple selection (§5.4, App. B).
  *
  * For each attribute, candidate pivot values are drawn from the attribute's
  * domain in R; the Shannon entropy (Eq. 5) of the converted-distance
  * histogram over P equal buckets measures converting quality. The value
  * with maximal entropy becomes the main pivot; if its entropy is below
  * `eMin`, auxiliary pivots are greedily added (maximizing the joint
  * bucket-vector entropy) up to `cntMax`, mirroring App. B.
  */
object PivotSelector {

  final case class Config(
      buckets: Int = 10,       // P
      eMin: Double = 1.5,
      cntMax: Int = 3,
      candLimit: Int = 40,     // candidate pivot values examined per attribute
      sampleVals: Int = 300,   // repository values used to score a candidate
      seed: Long = 7,
  )

  /** Shannon entropy of the distance histogram of one pivot (Eq. 5). */
  def entropy(pivTokens: Set[String], values: IndexedSeq[Set[String]], buckets: Int): Double = {
    val counts = new Array[Int](buckets)
    values.foreach { v =>
      val d = Text.jdist(v, pivTokens)
      val b = math.min(buckets - 1, (d * buckets).toInt)
      counts(b) += 1
    }
    histEntropy(counts.iterator.filter(_ > 0), values.size)
  }

  /** Joint entropy of the bucket-vector histogram of several pivots. */
  def jointEntropy(pivs: Seq[Set[String]], values: IndexedSeq[Set[String]], buckets: Int): Double = {
    val counts = mutable.HashMap.empty[Seq[Int], Int]
    values.foreach { v =>
      val key = pivs.map(p => math.min(buckets - 1, (Text.jdist(v, p) * buckets).toInt))
      counts.update(key, counts.getOrElse(key, 0) + 1)
    }
    histEntropy(counts.valuesIterator, values.size)
  }

  private def histEntropy(counts: Iterator[Int], n: Int): Double = {
    var h = 0.0
    counts.foreach { c =>
      val p = c.toDouble / n
      h -= p * math.log(p)
    }
    h
  }

  /** Select up to cntMax pivot values for one attribute (main pivot first). */
  def selectForAttr(repo: Repo, j: Int, cfg: Config = Config()): Vector[String] = {
    val rnd    = new Random(cfg.seed + j)
    val dom    = repo.doms(j)
    val domTok = repo.domTokens(j)
    val sample: IndexedSeq[Set[String]] =
      if (domTok.size <= cfg.sampleVals) domTok
      else rnd.shuffle(domTok.indices.toVector).take(cfg.sampleVals).map(domTok)
    val candIdx =
      if (dom.size <= cfg.candLimit) dom.indices.toVector
      else rnd.shuffle(dom.indices.toVector).take(cfg.candLimit)

    // Main pivot: argmax single entropy (deterministic tie-break by value).
    val scored = candIdx.map(i => (i, entropy(domTok(i), sample, cfg.buckets)))
      .sortBy { case (i, h) => (-h, dom(i)) }
    var chosen  = Vector(scored.head._1)
    var h       = scored.head._2
    // Auxiliary pivots until the joint entropy reaches eMin or cntMax is hit.
    while (h < cfg.eMin && chosen.size < cfg.cntMax) {
      val remaining = candIdx.filterNot(chosen.contains)
      if (remaining.isEmpty) h = cfg.eMin
      else {
        val best = remaining
          .map(i => (i, jointEntropy((chosen :+ i).map(domTok), sample, cfg.buckets)))
          .sortBy { case (i, hh) => (-hh, dom(i)) }
          .head
        chosen = chosen :+ best._1
        h = best._2
      }
    }
    chosen.map(dom)
  }

  def select(repo: Repo, cfg: Config = Config()): Pivots =
    Pivots((0 until repo.d).map(j => selectForAttr(repo, j, cfg)).toVector)

  final case class Selected(pivots: Pivots, nanos: Long)

  /** Timed selection — the Fig. 11 (App. C.1) cost probe. */
  def timedSelect(repo: Repo, cfg: Config = Config()): Selected = {
    val t0 = System.nanoTime()
    val p  = select(repo, cfg)
    Selected(p, System.nanoTime() - t0)
  }
}
