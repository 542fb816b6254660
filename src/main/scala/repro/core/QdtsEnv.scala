package repro.core

import scala.collection.mutable.ArrayBuffer
import repro.index.{OctNode, Octree}
import repro.traj.ErrorMeasures

/** Hyper-parameters of RL4QDTS (Section IV-D / V-A). Paper values S=9, E=12,
  * K=2, Δ=50 are tied to millions-of-points databases; defaults here are the
  * same mechanism at repro scale (see DESIGN.md substitutions).
  */
final case class QdtsParams(
    startLevel: Int = 4, // S: Agent-Cube starts from a query-distribution-sampled cube at this level
    maxLevel: Int = 8,   // E: maximum octree level
    k: Int = 2,          // K: Agent-Point state/action size
    delta: Int = 50,     // Δ: insertions between reward evaluations
    leafCap: Int = 32)   // adaptive octree split threshold
    extends Serializable

/** The shared environment of Agent-Cube and Agent-Point: the octree with
  * query counts, the growing simplified database D', and *incremental*
  * range-query F1 bookkeeping so the reward signal
  * `diff(Q(D),Q(D')) − diff(Q(D),Q(D''))` costs O(#queries) per insertion
  * instead of re-running the workload.
  */
final class QdtsEnv(val db: Array[Traj], val workload: Array[Box], val params: QdtsParams) {

  val octree = new Octree(db, params.maxLevel, params.leafCap)
  workload.foreach(octree.addQuery)

  private val inserted: Array[Array[Boolean]] = db.map(tr => new Array[Boolean](tr.length))
  private val kept: Array[java.util.TreeSet[Integer]] = db.map(_ => new java.util.TreeSet[Integer]())
  var insertedCount: Int = 0

  // ---- incremental F1 over the range-query workload ----
  // ground truth on the original database
  private val gt: Array[Array[Boolean]] = workload.map { q =>
    db.map(tr => tr.points.exists(q.contains))
  }
  private val gtSize: Array[Int] = gt.map(_.count(identity))
  // current state on the simplified database
  private val inBox: Array[Array[Boolean]] = workload.map(_ => new Array[Boolean](db.length))
  private val rsSize: Array[Int] = new Array[Int](workload.length)
  private val matched: Array[Int] = new Array[Int](workload.length)

  // D' starts as the most simplified database: endpoints of every trajectory.
  for (ti <- db.indices) {
    insertPoint(ti, 0)
    if (db(ti).length > 1) insertPoint(ti, db(ti).length - 1)
  }

  /** Insert point `pi` of trajectory `ti` into D'. Returns false if it was
    * already inserted. Updates the octree's remaining counters and the
    * incremental F1 state of every workload query.
    */
  def insertPoint(ti: Int, pi: Int): Boolean = {
    if (inserted(ti)(pi)) return false
    inserted(ti)(pi) = true
    kept(ti).add(pi)
    insertedCount += 1
    val p = db(ti).points(pi)
    octree.markInserted(p)
    var qi = 0
    while (qi < workload.length) {
      if (workload(qi).contains(p) && !inBox(qi)(ti)) {
        inBox(qi)(ti) = true
        rsSize(qi) += 1
        if (gt(qi)(ti)) matched(qi) += 1
      }
      qi += 1
    }
    true
  }

  /** Mean F1 of the workload on the current D' vs the original D (Eq. 3). */
  def avgF1: Double = {
    if (workload.isEmpty) return 1.0
    var s = 0.0
    var qi = 0
    while (qi < workload.length) {
      s += {
        if (gtSize(qi) == 0 && rsSize(qi) == 0) 1.0
        else if (gtSize(qi) == 0 || rsSize(qi) == 0 || matched(qi) == 0) 0.0
        else {
          val p = matched(qi).toDouble / rsSize(qi)
          val r = matched(qi).toDouble / gtSize(qi)
          2 * p * r / (p + r)
        }
      }
      qi += 1
    }
    s / workload.length
  }

  /** The QDTS objective term diff(Q(D), Q(D')) = 1 − mean F1. */
  def diff: Double = 1.0 - avgF1

  def result: SimpleDB = {
    import scala.jdk.CollectionConverters._
    SimpleDB(db.indices.map { ti =>
      db(ti).id -> kept(ti).asScala.iterator.map(_.intValue()).toArray
    }.toMap)
  }

  // ---------------- Agent-Cube support ----------------

  /** Sample a start cube at level S, restricted to cubes that still have
    * un-inserted points. The full model samples by the query distribution
    * (the paper's start-level technique; weight Q + 0.5 keeps query-free
    * cubes reachable); the w/o-Agent-Cube ablation samples by the data
    * distribution, exactly as in the paper's Table II setup.
    */
  def sampleStartNode(rng: java.util.Random, byQuery: Boolean = true): OctNode = {
    val frontier = octree.frontierAtLevel(params.startLevel).filter(_.remaining > 0)
    require(frontier.nonEmpty, "no un-inserted points left")
    val totalPts = math.max(octree.root.nPoints, 1).toDouble
    val weights =
      if (byQuery)
        // smoothed estimate of the query density: empirical per-cube query
        // count plus the expected count under a data prior (the raw counts of
        // a 100-query workload are too noisy to sample from directly)
        frontier.map(n => n.q + (n.nPoints / totalPts) * workload.length)
      else frontier.map(_.nPoints.toDouble)
    var u = rng.nextDouble() * weights.sum
    var i = 0
    while (i < frontier.length - 1 && u > weights(i)) { u -= weights(i); i += 1 }
    frontier(i)
  }

  /** Agent-Cube state (Eq. 4): the 8 children's trajectory-count and
    * query-count ratios. A leaf yields the zero state.
    */
  def cubeState(node: OctNode): Array[Double] = {
    val s = new Array[Double](16)
    if (node.isLeaf) return s
    val m = math.max(node.m, 1).toDouble
    val q = math.max(node.q, 1).toDouble
    var c = 0
    while (c < 8) {
      s(2 * c) = node.children(c).m / m
      s(2 * c + 1) = node.children(c).q / q
      c += 1
    }
    s
  }

  /** Valid actions at a cube: descend into children that still have
    * un-inserted points (actions 0–7), or stop (action 8 — the paper's a=9).
    */
  def cubeMask(node: OctNode): Array[Boolean] = {
    val mask = new Array[Boolean](9)
    mask(8) = true
    if (!node.isLeaf) {
      var c = 0
      while (c < 8) { mask(c) = node.children(c).remaining > 0; c += 1 }
    }
    mask
  }

  // ---------------- Agent-Point support ----------------

  /** A candidate insertion: the point of trajectory `trajIdx` (index into db)
    * with the maximum v_s among the trajectory's un-inserted points in the
    * cube (Eq. 7). `vs`/`vt` are the raw spatial/temporal values of Eq. 6.
    */
  final case class Candidate(trajIdx: Int, ptIdx: Int, vs: Double, vt: Double)

  /** Per-trajectory best candidates in cube `node`, sorted by descending v_s,
    * truncated to K (Eq. 8). Empty only if the cube has no un-inserted points.
    */
  def candidates(node: OctNode): Array[Candidate] = {
    val best = scala.collection.mutable.HashMap.empty[Int, Candidate]
    val it = octree.pointsIn(node)
    while (it.hasNext) {
      val (ti, pi) = it.next()
      if (!inserted(ti)(pi)) {
        val (vs, vt) = pointValues(ti, pi)
        best.get(ti) match {
          case Some(c) if c.vs >= vs => ()
          case _                     => best(ti) = Candidate(ti, pi, vs, vt)
        }
      }
    }
    best.values.toArray.sortBy(c => (-c.vs, c.trajIdx)).take(params.k)
  }

  /** (v_s, v_t) of Eq. 6: v_s is the SED of the point w.r.t. its current
    * anchor segment in D' (the kept points immediately before and after it);
    * v_t is the time difference to the spatially closest point on that anchor.
    */
  def pointValues(ti: Int, pi: Int): (Double, Double) = {
    val tr = db(ti)
    val a = kept(ti).floor(pi - 1)
    val b = kept(ti).ceiling(pi + 1)
    // endpoints are always kept, and pi itself is not, so both exist
    val pa = tr.points(a); val pb = tr.points(b); val p = tr.points(pi)
    val vs = ErrorMeasures.sed(pa, pb, p)
    val vt = {
      val dx = pb.x - pa.x; val dy = pb.y - pa.y
      val len2 = dx * dx + dy * dy
      val u = if (len2 == 0) 0.0
              else math.max(0.0, math.min(1.0, ((p.x - pa.x) * dx + (p.y - pa.y) * dy) / len2))
      val tClosest = pa.t + u * (pb.t - pa.t)
      math.abs(p.t - tClosest)
    }
    (vs, vt)
  }

  /** Agent-Point state (Eq. 8): the K candidates' (v_s, v_t), normalised by
    * the cube's spatial diagonal and temporal extent (the paper uses batch
    * normalisation for the same purpose); zero-padded and masked when the
    * cube holds fewer than K trajectories.
    */
  def pointState(node: OctNode, cands: Array[Candidate]): (Array[Double], Array[Boolean]) = {
    val s = new Array[Double](2 * params.k)
    val mask = new Array[Boolean](params.k)
    val diag = math.max(node.box.spatialDiag, 1e-9)
    val text = math.max(node.box.tExtent, 1e-9)
    var i = 0
    while (i < cands.length && i < params.k) {
      s(2 * i) = cands(i).vs / diag
      s(2 * i + 1) = cands(i).vt / text
      mask(i) = true
      i += 1
    }
    (s, mask)
  }

  /** All current anchor intervals collected (test support). */
  private[core] def keptIndices(ti: Int): Array[Int] = {
    val buf = ArrayBuffer.empty[Int]
    val it = kept(ti).iterator()
    while (it.hasNext) buf += it.next().intValue()
    buf.toArray
  }

  private[core] def isInserted(ti: Int, pi: Int): Boolean = inserted(ti)(pi)
}
