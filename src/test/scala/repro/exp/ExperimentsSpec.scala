package repro.exp

import repro.SparkSpec
import repro.core.Model
import repro.data.TrajGen

/** Tests of the shared experiment harness (evaluator, adaptive parameters,
  * table rendering) that the bench suites build on.
  */
class ExperimentsSpec extends SparkSpec {

  // small but non-trivial database in the bench profile family
  private lazy val db = TrajGen.genLocal(Experiments.benchProfile.copy(avgLen = 150), 20, 9)

  test("paramsFor scales the start level with database size") {
    assert(Experiments.paramsFor(50_000).startLevel === 3)
    assert(Experiments.paramsFor(135_000).startLevel === 3)
    assert(Experiments.paramsFor(350_000).startLevel === 4)
    assert(Experiments.paramsFor(3_000_000).startLevel === 5)
    // never beyond maxLevel - 1
    assert(Experiments.paramsFor(Long.MaxValue / 4).startLevel
      <= Experiments.benchParams.maxLevel - 1)
  }

  test("evaluator range queries have non-empty ground truths") {
    val ev = new Experiments.Evaluator(db, "data", nRange = 20, nKnn = 2, nSim = 2, clusterTrajs = 10)
    assert(ev.rangeQs.length === 20)
    assert(ev.gtSummary.contains("rangeGT(nonempty)=20/20"))
  }

  test("the identity simplification scores (near) perfect on every task") {
    val ev = new Experiments.Evaluator(db, "data", nRange = 15, nKnn = 2, nSim = 2, clusterTrajs = 8)
    val identity = repro.core.SimpleDB(db.map(t => t.id -> Array.tabulate(t.length)(i => i)).toMap)
    val f1 = ev.evaluate(identity)
    assert(f1.range === 1.0)
    assert(f1.knnEdr === 1.0 && f1.knnEmbed === 1.0)
    assert(f1.similarity === 1.0)
    assert(f1.clustering === 1.0)
  }

  test("endpoint-only simplification scores within [0,1] and below identity on range") {
    val ev = new Experiments.Evaluator(db, "data", nRange = 15, nKnn = 2, nSim = 2, clusterTrajs = 8)
    val f1 = ev.evaluate(Model.firstLast(db))
    for (v <- Seq(f1.range, f1.knnEdr, f1.knnEmbed, f1.similarity, f1.clustering))
      assert(v >= 0.0 && v <= 1.0)
    assert(f1.range < 1.0) // straight-line 2-point trajectories must lose some queries
  }

  test("rangeF1 agrees with the range component of evaluate") {
    val ev = new Experiments.Evaluator(db, "data", nRange = 10, nKnn = 2, nSim = 2, clusterTrajs = 6)
    val s = Model.firstLast(db)
    assert(math.abs(ev.rangeF1(s) - ev.evaluate(s).range) < 1e-12)
  }

  test("meanSedOfReturned is 0 for identity and positive for endpoints-only") {
    val ev = new Experiments.Evaluator(db, "data", nRange = 10, nKnn = 2, nSim = 2, clusterTrajs = 6)
    val identity = repro.core.SimpleDB(db.map(t => t.id -> Array.tabulate(t.length)(i => i)).toMap)
    assert(ev.meanSedOfReturned(identity) === 0.0)
    assert(ev.meanSedOfReturned(Model.firstLast(db)) > 0.0)
  }

  test("printTable renders all rows and columns") {
    val s = Experiments.printTable("t", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    assert(s.contains("| a  | bb |"))
    assert(s.contains("| 33 | 4  |"))
  }

  test("time measures wall time") {
    val (v, t) = Experiments.time { Thread.sleep(30); 42 }
    assert(v === 42 && t >= 0.025)
  }
}
