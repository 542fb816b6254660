package repro.baselines

import repro.SparkSpec
import repro.core.{Model, Point, Traj}
import repro.data.TrajGen
import repro.traj.ErrorMeasures
import repro.traj.ErrorMeasures.{PED, SED}

/** Top-Down baseline tests (E and W adaptations, all measures). */
class TopDownSpec extends SparkSpec {

  private def zigzag(n: Int): Traj =
    Traj(0, Array.tabulate(n)(i => Point(i, if (i % 2 == 0) 0 else 10, i)))

  test("simplifyOne respects the budget and keeps endpoints") {
    val tr = zigzag(20)
    for (m <- ErrorMeasures.all) {
      val kept = TopDown.simplifyOne(m, tr, 6)
      assert(kept.length === 6, m.name)
      assert(kept.head === 0 && kept.last === 19, m.name)
      assert(kept.toSeq === kept.sorted.toSeq)
    }
  }

  test("budget >= n returns the identity simplification") {
    val tr = zigzag(5)
    assert(TopDown.simplifyOne(SED, tr, 10).toSeq === Seq(0, 1, 2, 3, 4))
  }

  test("tiny trajectories are returned unchanged") {
    val two = Traj(0, Array(Point(0, 0, 0), Point(1, 1, 1)))
    assert(TopDown.simplifyOne(SED, two, 2).toSeq === Seq(0, 1))
  }

  test("the first inserted point is the max-error point (Douglas-Peucker)") {
    // a single spike at index 7 dominates
    val pts = Array.tabulate(15)(i => Point(i, if (i == 7) 100 else 0, i))
    val kept = TopDown.simplifyOne(SED, Traj(0, pts), 3)
    assert(kept.toSeq === Seq(0, 7, 14))
  }

  test("error decreases monotonically with budget") {
    val tr = zigzag(30)
    val errs = Seq(4, 8, 16).map(b => ErrorMeasures.trajError(SED, tr, TopDown.simplifyOne(SED, tr, b)))
    assert(errs(0) >= errs(1) && errs(1) >= errs(2))
  }

  test("simplifyE applies proportional budgets per trajectory") {
    val db = TrajGen.genLocal(TrajGen.chengdu, 8, 3)
    val n = Model.totalPoints(db)
    val w = (0.1 * n).toInt
    val s = TopDown.simplifyE(SED, db, w)
    for (tr <- db) {
      val kept = s.kept(tr.id)
      assert(kept.length >= 2 && kept.head === 0 && kept.last === tr.length - 1)
      assert(kept.length <= math.max(2, (0.1 * tr.length).toInt) + 1)
    }
  }

  test("simplifyW meets the global budget exactly when possible") {
    val db = TrajGen.genLocal(TrajGen.chengdu, 8, 5)
    val w = (0.05 * Model.totalPoints(db)).toInt.max(2 * db.length + 5)
    val s = TopDown.simplifyW(PED, db, w)
    assert(s.totalPoints === w)
    for (tr <- db) {
      val kept = s.kept(tr.id)
      assert(kept.head === 0 && kept.last === tr.length - 1)
    }
  }

  test("simplifyW allocates more points to complex trajectories than E does") {
    // one straight line + one zigzag of the same length: W should spend
    // almost the whole extra budget on the zigzag
    val straight = Traj(0, Array.tabulate(50)(i => Point(i, 0, i)))
    val zz = Traj(1, zigzag(50).points)
    val db = Array(straight, zz)
    val s = TopDown.simplifyW(SED, db, 20)
    assert(s.kept(1L).length > s.kept(0L).length)
    assert(s.kept(0L).length === 2) // the straight line needs nothing more
  }

  test("W never exceeds the budget even with many trajectories") {
    val db = TrajGen.genLocal(TrajGen.chengdu, 10, 9)
    val w = 2 * db.length + 17
    assert(TopDown.simplifyW(SED, db, w).totalPoints <= w)
  }

  test("all four measures produce valid simplifications on generated data") {
    val db = TrajGen.genLocal(TrajGen.chengdu, 5, 11)
    for (m <- ErrorMeasures.all) {
      val s = TopDown.simplifyE(m, db, (0.2 * Model.totalPoints(db)).toInt)
      for (tr <- db) {
        val kept = s.kept(tr.id)
        assert(kept.distinct.length === kept.length)
        assert(kept.forall(i => i >= 0 && i < tr.length))
      }
    }
  }
}
