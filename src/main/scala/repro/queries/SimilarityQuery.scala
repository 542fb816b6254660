package repro.queries

import repro.core.Traj

/** Similarity query (Section III-B): return every trajectory whose
  * time-synchronised distance to the query trajectory stays within `delta`
  * (the paper's 5 km) at every instant of the window [ts, te].
  *
  * Simplified trajectories have sparse samples, so both sides are linearly
  * interpolated at a common grid of `nSamples` instants across the window
  * (restricted to instants where the query itself is defined). A trajectory
  * undefined at any such instant does not qualify.
  */
object SimilarityQuery {

  def similar(db: Array[Traj], q: Traj, ts: Double, te: Double, delta: Double,
              nSamples: Int = 32): Set[Long] = {
    require(te >= ts)
    val times = (0 until nSamples)
      .map(i => if (nSamples == 1) ts else ts + i * (te - ts) / (nSamples - 1))
      .filter(t => q.at(t).isDefined)
    if (times.isEmpty) return Set.empty
    val qPts = times.map(t => (t, q.at(t).get))
    db.iterator
      .filter { tr =>
        tr.id != q.id && qPts.forall { case (t, qp) =>
          tr.at(t).exists(p => p.distTo(qp) <= delta)
        }
      }
      .map(_.id)
      .toSet
  }
}
