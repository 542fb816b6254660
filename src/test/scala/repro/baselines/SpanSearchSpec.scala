package repro.baselines

import repro.SparkSpec
import repro.core.{Model, Point, Traj}
import repro.data.TrajGen

/** Span-Search (direction-preserving, DAD-only) baseline tests. */
class SpanSearchSpec extends SparkSpec {

  test("greedy at tolerance 0 keeps every direction change") {
    val pts = Array(Point(0, 0, 0), Point(1, 0, 1), Point(2, 1, 2), Point(3, 1, 3))
    val kept = SpanSearch.greedy(Traj(0, pts), 0.0)
    assert(kept.toSeq === Seq(0, 1, 2, 3))
  }

  test("greedy at tolerance 0 collapses a perfectly straight run") {
    val tr = Traj(0, Array.tabulate(10)(i => Point(i, 0, i)))
    assert(SpanSearch.greedy(tr, 1e-9).toSeq === Seq(0, 9))
  }

  test("greedy at tolerance π keeps only the endpoints") {
    val rng = new java.util.Random(3)
    val tr = Traj(0, Array.tabulate(20)(i => Point(rng.nextDouble() * 100, rng.nextDouble() * 100, i)))
    assert(SpanSearch.greedy(tr, math.Pi).toSeq === Seq(0, 19))
  }

  test("larger tolerance never keeps more points") {
    val db = TrajGen.genLocal(TrajGen.chengdu, 3, 5)
    for (tr <- db) {
      val k1 = SpanSearch.greedy(tr, 0.1).length
      val k2 = SpanSearch.greedy(tr, 0.5).length
      val k3 = SpanSearch.greedy(tr, 1.5).length
      assert(k1 >= k2 && k2 >= k3)
    }
  }

  test("simplifyOne meets the budget") {
    val db = TrajGen.genLocal(TrajGen.chengdu, 4, 7)
    for (tr <- db) {
      val b = math.max(2, tr.length / 10)
      val kept = SpanSearch.simplifyOne(tr, b)
      assert(kept.length <= b + 1, s"budget $b, got ${kept.length}")
      assert(kept.head === 0 && kept.last === tr.length - 1)
    }
  }

  test("simplifyOne with ample budget returns everything") {
    val tr = TrajGen.genLocal(TrajGen.chengdu, 1, 9)(0)
    assert(SpanSearch.simplifyOne(tr, tr.length).length === tr.length)
  }

  test("kept indices are a strictly increasing subsequence with endpoints") {
    val db = TrajGen.genLocal(TrajGen.chengdu, 5, 11)
    val s = SpanSearch.simplifyE(db, (0.1 * Model.totalPoints(db)).toInt)
    for (tr <- db) {
      val kept = s.kept(tr.id)
      assert(kept.toSeq === kept.sorted.toSeq)
      assert(kept.distinct.length === kept.length)
      assert(kept.head === 0 && kept.last === tr.length - 1)
    }
  }

  test("stationary (zero-length) stretches are collapsible") {
    val pts = Array(Point(0, 0, 0), Point(0, 0, 1), Point(0, 0, 2), Point(5, 5, 3))
    val kept = SpanSearch.greedy(Traj(0, pts), 0.01)
    assert(kept.length <= 3)
  }
}
