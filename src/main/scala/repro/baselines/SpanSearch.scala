package repro.baselines

import scala.collection.mutable.ArrayBuffer
import repro.core.{SimpleDB, Traj}
import repro.traj.ErrorMeasures.{angle, angleDiff}

/** Span-Search baseline (Long et al., PVLDB'14 [12]) — direction-preserving
  * simplification, DAD only, per-trajectory (the W adaptation is not possible,
  * as the paper notes).
  *
  * For a direction tolerance ε, a greedy pass keeps extending the current
  * anchor while every original segment direction under it stays within ε of
  * the anchor direction (the "direction span" stays narrow). A binary search
  * over ε finds the tightest tolerance whose greedy simplification fits the
  * per-trajectory budget — the error-search strategy of the original.
  */
object SpanSearch {

  /** Greedy direction-span pass at tolerance `tol`; returns kept indices.
    * The per-advance direction recheck is strided once the window exceeds
    * `exactWindow` segments (an O(n·w) -> O(n·exactWindow) bound; long windows
    * only occur on near-straight stretches where the strided check is a tight
    * approximation).
    */
  private[baselines] def greedy(tr: Traj, tol: Double, exactWindow: Int = 256): Array[Int] = {
    val n = tr.length
    if (n <= 2) return Array.tabulate(n)(identity)
    val kept = ArrayBuffer(0)
    var s = 0
    var i = s + 2 // candidate anchor end: segment s..i must cover >= 2 original segments
    while (s < n - 1) {
      var end = s + 1 // furthest valid anchor end found so far
      i = s + 2
      var ok = true
      while (ok && i < n) {
        // anchor s -> i must be within tol of every original direction in [s, i)
        angle(tr.points(s), tr.points(i)) match {
          case Some(anchorDir) =>
            val w = i - s
            val stride = math.max(1, w / exactWindow)
            var j = s
            var valid = true
            while (valid && j < i) {
              angle(tr.points(j), tr.points(j + 1)) match {
                case Some(d) => if (angleDiff(anchorDir, d) > tol) valid = false
                case None    => () // zero-length original segment: no direction
              }
              // always include the window's last original segment in the check
              j = if (j + stride >= i && j < i - 1) i - 1 else j + stride
            }
            if (valid) { end = i; i += 1 } else ok = false
          case None =>
            // zero-length anchor: only acceptable if every covered segment is
            // also zero-length
            val allZero = (s until i).forall(j => angle(tr.points(j), tr.points(j + 1)).isEmpty)
            if (allZero) { end = i; i += 1 } else ok = false
        }
      }
      kept += end
      s = end
    }
    kept.toArray
  }

  /** Simplify one trajectory to at most `budget` points via binary search on ε. */
  def simplifyOne(tr: Traj, budget: Int): Array[Int] = {
    val n = tr.length
    if (n <= 2 || budget >= n) return Array.tabulate(n)(identity)
    val b = math.max(2, budget)
    var lo = 0.0; var hi = math.Pi
    var best = greedy(tr, hi)
    var it = 0
    while (it < 16) { // π/2^16 ≈ 5e-5 rad resolution — beyond any budget granularity
      val mid = (lo + hi) / 2
      val kept = greedy(tr, mid)
      if (kept.length <= b) { best = kept; hi = mid } else lo = mid
      it += 1
    }
    best
  }

  /** E adaptation (the only one): per-trajectory proportional budgets. */
  def simplifyE(db: Array[Traj], totalBudget: Int): SimpleDB = {
    val n = db.map(_.length.toLong).sum
    val r = totalBudget.toDouble / n
    SimpleDB(db.map(tr => tr.id -> simplifyOne(tr, math.max(2, (r * tr.length).toInt))).toMap)
  }
}
