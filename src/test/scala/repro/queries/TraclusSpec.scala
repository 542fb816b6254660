package repro.queries

import repro.SparkSpec
import repro.core.{Point, Traj}
import repro.queries.Traclus.Seg

/** TRACLUS-lite clustering tests: partitioning, segment distance, DBSCAN,
  * and the pairs result set.
  */
class TraclusSpec extends SparkSpec {

  test("characteristic points of a straight line are its endpoints") {
    val tr = Traj(0, Array.tabulate(10)(i => Point(i, 0, i)))
    assert(Traclus.characteristicPoints(tr, tol = 0.1).toSeq === Seq(0, 9))
  }

  test("characteristic points keep a sharp corner") {
    val pts = Array.tabulate(11)(i =>
      if (i <= 5) Point(i, 0, i) else Point(5, i - 5.0, i))
    val cp = Traclus.characteristicPoints(Traj(0, pts), tol = 0.1).toSeq
    assert(cp.contains(5))
  }

  test("characteristic points of short trajectories are all points") {
    assert(Traclus.characteristicPoints(Traj(0, Array(Point(0, 0, 0))), 1.0).toSeq === Seq(0))
    assert(Traclus.characteristicPoints(
      Traj(0, Array(Point(0, 0, 0), Point(1, 1, 1))), 1.0).toSeq === Seq(0, 1))
  }

  test("partition emits segments between consecutive characteristic points") {
    val tr = Traj(7, Array.tabulate(10)(i => Point(i * 10.0, 0, i)))
    val segs = Traclus.partition(Array(tr), tol = 0.5)
    assert(segs.length === 1)
    assert(segs(0).trajId === 7 && segs(0).a.x === 0.0 && segs(0).b.x === 90.0)
  }

  test("partition drops zero-length segments") {
    val tr = Traj(0, Array(Point(0, 0, 0), Point(0, 0, 1)))
    assert(Traclus.partition(Array(tr), 0.1, minLen = 1.0).isEmpty)
  }

  test("segment distance of identical segments is 0") {
    val s = Seg(0, Point(0, 0, 0), Point(10, 0, 0))
    assert(Traclus.segDist(s, s) === 0.0)
  }

  test("segment distance is symmetric (longer segment is the reference)") {
    val s1 = Seg(0, Point(0, 0, 0), Point(10, 0, 0))
    val s2 = Seg(1, Point(2, 1, 0), Point(8, 1, 0))
    assert(Traclus.segDist(s1, s2) === Traclus.segDist(s2, s1))
  }

  test("parallel nearby segments are closer than distant ones") {
    val s = Seg(0, Point(0, 0, 0), Point(10, 0, 0))
    val near = Seg(1, Point(0, 1, 0), Point(10, 1, 0))
    val far = Seg(2, Point(0, 100, 0), Point(10, 100, 0))
    assert(Traclus.segDist(s, near) < Traclus.segDist(s, far))
  }

  test("perpendicular segments pay the angular penalty") {
    val s = Seg(0, Point(0, 0, 0), Point(10, 0, 0))
    val par = Seg(1, Point(0, 1, 0), Point(10, 1, 0))
    val perp = Seg(2, Point(5, 1, 0), Point(5, 11, 0))
    assert(Traclus.segDist(s, perp) > Traclus.segDist(s, par))
  }

  test("DBSCAN groups dense parallel bundles and flags isolated segments as noise") {
    val bundle = Array.tabulate(6)(i => Seg(i, Point(0, i * 2.0, 0), Point(100, i * 2.0, 0)))
    val lone = Seg(99, Point(5000, 5000, 0), Point(5100, 5000, 0))
    val cids = Traclus.dbscan(bundle :+ lone, eps = 30, minLns = 3)
    assert(cids.take(6).toSet.size === 1 && cids(0) >= 0)
    assert(cids.last === -1)
  }

  test("DBSCAN with impossible minLns yields all noise") {
    val segs = Array.tabulate(3)(i => Seg(i, Point(0, i * 1000.0, 0), Point(10, i * 1000.0, 0)))
    assert(Traclus.dbscan(segs, eps = 1, minLns = 5).forall(_ === -1))
  }

  test("clusterPairs returns co-clustered trajectory pairs") {
    // two bundles of 3 trajectories each, far apart
    def mk(id: Long, y: Double) = Traj(id, Array.tabulate(6)(i => Point(i * 100.0, y, i)))
    val db = Array(mk(0, 0), mk(1, 5), mk(2, 10), mk(3, 100000), mk(4, 100005), mk(5, 100010))
    val pairs = Traclus.clusterPairs(db, tol = 1.0, eps = 100, minLns = 2)
    val expected = Set((0L, 1L), (0L, 2L), (1L, 2L), (3L, 4L), (3L, 5L), (4L, 5L))
    assert(pairs === expected)
  }

  test("clusterPairs of an empty database is empty") {
    assert(Traclus.clusterPairs(Array.empty, 1.0, 10, 2) === Set.empty)
  }
}
