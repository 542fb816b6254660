package repro.queries

import scala.collection.mutable
import repro.core.{Point, Traj}

/** TRACLUS partition-and-group trajectory clustering (Lee et al., SIGMOD'07) —
  * the clustering operator of the paper's evaluation.
  *
  *  - Partition: characteristic points are selected per trajectory. The
  *    original uses MDL; we use Douglas–Peucker with a perpendicular tolerance,
  *    which selects characteristic points at matched tolerances (substitution
  *    documented in DESIGN.md).
  *  - Group: DBSCAN over the resulting line segments using the TRACLUS
  *    segment distance (perpendicular + parallel + angular components).
  *  - Output: clusters of segments; the evaluation measure is the pairs-F1
  *    over trajectory pairs sharing a cluster.
  */
object Traclus {

  /** A directed line segment of trajectory `trajId`. */
  final case class Seg(trajId: Long, a: Point, b: Point) {
    def len: Double = a.distTo(b)
  }

  /** Douglas–Peucker characteristic points (indices) with tolerance `tol`. */
  def characteristicPoints(tr: Traj, tol: Double): Array[Int] = {
    val n = tr.length
    if (n <= 2) return Array.tabulate(n)(identity)
    val keep = mutable.SortedSet(0, n - 1)
    val stack = mutable.Stack((0, n - 1))
    while (stack.nonEmpty) {
      val (a, b) = stack.pop()
      if (b - a > 1) {
        var worst = -1.0; var wi = -1
        var i = a + 1
        while (i < b) {
          val d = repro.traj.ErrorMeasures.ped(tr.points(a), tr.points(b), tr.points(i))
          if (d > worst) { worst = d; wi = i }
          i += 1
        }
        if (worst > tol) { keep += wi; stack.push((a, wi)); stack.push((wi, b)) }
      }
    }
    keep.toArray
  }

  /** Partition phase: characteristic segments of every trajectory. Segments
    * shorter than `minLen` carry no direction information and are dropped.
    */
  def partition(db: Array[Traj], tol: Double, minLen: Double = 1.0): Array[Seg] =
    db.flatMap { tr =>
      val cp = characteristicPoints(tr, tol)
      cp.iterator.zip(cp.iterator.drop(1)).map { case (i, j) => Seg(tr.id, tr.points(i), tr.points(j)) }
        .filter(_.len >= minLen)
        .toArray
    }

  /** TRACLUS distance between two segments: perpendicular + parallel + angular
    * components (Lee et al., Section 3.2). `si` is treated as the longer one.
    */
  def segDist(s1: Seg, s2: Seg): Double = {
    val (li, lj) = if (s1.len >= s2.len) (s1, s2) else (s2, s1)
    val dx = li.b.x - li.a.x; val dy = li.b.y - li.a.y
    val len2 = math.max(dx * dx + dy * dy, 1e-12)
    def proj(p: Point): (Double, Double) = {
      // (parameter u along li, perpendicular distance)
      val u = ((p.x - li.a.x) * dx + (p.y - li.a.y) * dy) / len2
      val px = li.a.x + u * dx; val py = li.a.y + u * dy
      (u, math.hypot(p.x - px, p.y - py))
    }
    val (u1, l1) = proj(lj.a); val (u2, l2) = proj(lj.b)
    val dPerp = if (l1 + l2 == 0) 0.0 else (l1 * l1 + l2 * l2) / (l1 + l2)
    val liLen = math.sqrt(len2)
    val par1 = math.min(math.abs(u1), math.abs(u1 - 1)) * liLen
    val par2 = math.min(math.abs(u2), math.abs(u2 - 1)) * liLen
    val dPar = math.min(par1, par2)
    val dAng = {
      import repro.traj.ErrorMeasures.{angle, angleDiff}
      (angle(li.a, li.b), angle(lj.a, lj.b)) match {
        case (Some(t1), Some(t2)) =>
          val th = angleDiff(t1, t2)
          if (th >= math.Pi / 2) lj.len else lj.len * math.sin(th)
        case _ => 0.0
      }
    }
    dPerp + dPar + dAng
  }

  /** DBSCAN over segments. Returns cluster id per segment (-1 = noise).
    * O(S^2) neighbourhood computation — fine at repro scale.
    */
  def dbscan(segs: Array[Seg], eps: Double, minLns: Int): Array[Int] = {
    val n = segs.length
    val cluster = Array.fill(n)(-2) // -2 unvisited, -1 noise, >=0 cluster id
    def neighbours(i: Int): mutable.ArrayBuffer[Int] = {
      val out = mutable.ArrayBuffer.empty[Int]
      var j = 0
      while (j < n) {
        if (segDist(segs(i), segs(j)) <= eps) out += j
        j += 1
      }
      out
    }
    var cid = 0
    var i = 0
    while (i < n) {
      if (cluster(i) == -2) {
        val nb = neighbours(i)
        if (nb.length < minLns) cluster(i) = -1
        else {
          cluster(i) = cid
          val queue = mutable.Queue(nb.toSeq: _*)
          while (queue.nonEmpty) {
            val j = queue.dequeue()
            if (cluster(j) == -1) cluster(j) = cid
            if (cluster(j) == -2) {
              cluster(j) = cid
              val nb2 = neighbours(j)
              if (nb2.length >= minLns) queue.enqueueAll(nb2)
            }
          }
          cid += 1
        }
      }
      i += 1
    }
    cluster
  }

  /** Full pipeline: the set of unordered trajectory-id pairs co-clustered in
    * at least one segment cluster — the paper's clustering result set R.
    */
  def clusterPairs(db: Array[Traj], tol: Double, eps: Double, minLns: Int): Set[(Long, Long)] = {
    val segs = partition(db, tol)
    if (segs.isEmpty) return Set.empty
    val cids = dbscan(segs, eps, minLns)
    val byCluster = segs.indices.groupBy(cids).filter(_._1 >= 0)
    val pairs = Set.newBuilder[(Long, Long)]
    for ((_, idxs) <- byCluster) {
      val trajs = idxs.map(i => segs(i).trajId).distinct.sorted
      for (i <- trajs.indices; j <- i + 1 until trajs.length)
        pairs += ((trajs(i), trajs(j)))
    }
    pairs.result()
  }
}
