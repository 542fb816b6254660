package repro.queries

import repro.SparkSpec
import repro.core.{Point, Traj}

/** Similarity query (synchronised threshold) tests. */
class SimilarityQuerySpec extends SparkSpec {

  private def lane(id: Long, y: Double, t0: Double = 0): Traj =
    Traj(id, Array.tabulate(11)(i => Point(i * 100.0, y, t0 + i * 10.0)))

  private val q = lane(99, 0)

  test("a parallel lane within delta qualifies") {
    val db = Array(lane(0, 1000))
    assert(SimilarityQuery.similar(db, q, 0, 100, delta = 2000) === Set(0L))
  }

  test("a lane beyond delta does not qualify") {
    val db = Array(lane(0, 9000))
    assert(SimilarityQuery.similar(db, q, 0, 100, delta = 2000) === Set.empty[Long])
  }

  test("the threshold must hold at every sampled instant") {
    // starts close, diverges halfway
    val div = Traj(1, Array.tabulate(11)(i =>
      Point(i * 100.0, if (i <= 5) 0 else 50000, i * 10.0)))
    assert(SimilarityQuery.similar(Array(div), q, 0, 100, delta = 2000) === Set.empty[Long])
    // but it qualifies on the first half window
    assert(SimilarityQuery.similar(Array(div), q, 0, 45, delta = 2000) === Set(1L))
  }

  test("trajectories not covering the window are excluded") {
    val late = lane(2, 0, t0 = 1000)
    assert(SimilarityQuery.similar(Array(late), q, 0, 100, delta = 2000) === Set.empty[Long])
  }

  test("the query trajectory itself is excluded by id") {
    assert(SimilarityQuery.similar(Array(q), q, 0, 100, delta = 2000) === Set.empty[Long])
  }

  test("window outside the query's own span yields empty") {
    val db = Array(lane(0, 0))
    assert(SimilarityQuery.similar(db, q, 5000, 6000, delta = 2000) === Set.empty[Long])
  }

  test("interpolation makes sparse (simplified) trajectories comparable") {
    // a 2-point simplified version of lane 0 — interpolation reconstructs it
    val simp = Traj(3, Array(Point(0, 0, 0), Point(1000, 0, 100)))
    assert(SimilarityQuery.similar(Array(simp), q, 0, 100, delta = 10) === Set(3L))
  }

  test("delta boundary is inclusive") {
    val db = Array(lane(0, 100))
    assert(SimilarityQuery.similar(db, q, 0, 100, delta = 100) === Set(0L))
  }
}
