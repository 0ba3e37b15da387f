package repro.eval

/** Effectiveness measures of §6.1 (Eq. 6). */
object Metrics {

  final case class PRF(precision: Double, recall: Double, f: Double)

  def prf(found: Set[(Long, Long)], truth: Set[(Long, Long)]): PRF = {
    val tp = found.count(truth.contains).toDouble
    val precision = if (found.isEmpty) 1.0 else tp / found.size
    val recall    = if (truth.isEmpty) 1.0 else tp / truth.size
    val f =
      if (precision + recall == 0) 0.0
      else 2 * precision * recall / (precision + recall)
    PRF(precision, recall, f)
  }
}
