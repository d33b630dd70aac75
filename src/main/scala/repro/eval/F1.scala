package repro.eval

/** Community quality metrics vs a ground-truth community (paper §8). */
object F1 {

  /** Precision |C ∩ Ĉ| / |C|; 0 for an empty discovery. */
  def precision(found: Set[Long], truth: Set[Long]): Double =
    if (found.isEmpty) 0.0 else found.intersect(truth).size.toDouble / found.size

  /** Recall |C ∩ Ĉ| / |Ĉ|; 0 for an empty ground truth. */
  def recall(found: Set[Long], truth: Set[Long]): Double =
    if (truth.isEmpty) 0.0 else found.intersect(truth).size.toDouble / truth.size

  /** Harmonic mean of precision and recall. */
  def f1(found: Set[Long], truth: Set[Long]): Double = {
    val p = precision(found, truth)
    val r = recall(found, truth)
    if (p + r == 0) 0.0 else 2 * p * r / (p + r)
  }
}
