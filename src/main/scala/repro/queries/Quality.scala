package repro.queries

/** F1-score quality measures (Eq. 3): results on the original database are
  * ground truth; results on the simplified database are scored against them.
  */
object Quality {

  /** Set F1 of `rs` (simplified result) against `ro` (original result).
    * Both empty -> perfect (1.0); one empty -> 0.0.
    */
  def f1[A](ro: Set[A], rs: Set[A]): Double = {
    if (ro.isEmpty && rs.isEmpty) return 1.0
    if (ro.isEmpty || rs.isEmpty) return 0.0
    val inter = ro.intersect(rs).size.toDouble
    if (inter == 0) return 0.0
    val p = inter / rs.size
    val r = inter / ro.size
    2 * p * r / (p + r)
  }

  /** kNN F1 = overlap / k (precision = recall for fixed k). */
  def knnF1(ro: Seq[Long], rs: Seq[Long]): Double = {
    require(ro.size == rs.size && ro.nonEmpty, "kNN results must both have k items")
    ro.toSet.intersect(rs.toSet).size.toDouble / ro.size
  }

  def mean(xs: Seq[Double]): Double = if (xs.isEmpty) 0.0 else xs.sum / xs.size

  def stddev(xs: Seq[Double]): Double = {
    if (xs.size <= 1) return 0.0
    val m = mean(xs)
    math.sqrt(xs.map(x => (x - m) * (x - m)).sum / (xs.size - 1))
  }
}
