package repro.queries

import repro.SparkSpec
import repro.core.Model
import repro.data.TrajGen

/** Workload generator tests: sizes, determinism, distribution shape. */
class WorkloadSpec extends SparkSpec {

  private val db = TrajGen.genLocal(TrajGen.chengdu, 20, 3)

  test("dataDist produces n queries of the requested extent") {
    val qs = Workload.dataDist(db, 25, 2000, 86400, seed = 1)
    assert(qs.length === 25)
    assert(qs.forall(q => math.abs((q.xmax - q.xmin) - 2000) < 1e-9))
    assert(qs.forall(q => math.abs((q.tmax - q.tmin) - 86400) < 1e-9))
  }

  test("dataDist is deterministic in the seed") {
    val a = Workload.dataDist(db, 10, 2000, 86400, seed = 5)
    val b = Workload.dataDist(db, 10, 2000, 86400, seed = 5)
    assert(a.toSeq === b.toSeq)
    val c = Workload.dataDist(db, 10, 2000, 86400, seed = 6)
    assert(a.toSeq !== c.toSeq)
  }

  test("dataDist centres are data points, so most queries are non-empty") {
    val qs = Workload.dataDist(db, 20, 2000, 86400, seed = 7)
    val nonEmpty = qs.count(q => RangeQuery.inMemory(db, q).nonEmpty)
    assert(nonEmpty === 20) // each query's centre itself is a point
  }

  test("gaussian centres stay within the domain") {
    val (xmin, xmax, ymin, ymax, _, _) = Model.bounds(db)
    val qs = Workload.gaussian(db, 50, 1000, 3600, mu = 0.5, sigma = 0.25, seed = 9)
    assert(qs.forall { q =>
      val cx = (q.xmin + q.xmax) / 2; val cy = (q.ymin + q.ymax) / 2
      cx >= xmin - 1e-6 && cx <= xmax + 1e-6 && cy >= ymin - 1e-6 && cy <= ymax + 1e-6
    })
  }

  test("gaussian with tiny sigma concentrates at mu") {
    val (xmin, xmax, _, _, _, _) = Model.bounds(db)
    val qs = Workload.gaussian(db, 50, 10, 10, mu = 0.5, sigma = 1e-9, seed = 11)
    val mid = xmin + 0.5 * (xmax - xmin)
    assert(qs.forall(q => math.abs((q.xmin + q.xmax) / 2 - mid) < 1.0))
  }

  test("zipf concentrates mass on few cells for large exponents") {
    val qs = Workload.zipf(db, 200, 100, 3600, a = 6.0, grid = 8, seed = 13)
    // bucket the centres into the grid; the top cell should dominate
    val (xmin, xmax, ymin, ymax, _, _) = Model.bounds(db)
    val cells = qs.map { q =>
      val cx = ((q.xmin + q.xmax) / 2 - xmin) / (xmax - xmin)
      val cy = ((q.ymin + q.ymax) / 2 - ymin) / (ymax - ymin)
      (math.min(7, (cx * 8).toInt), math.min(7, (cy * 8).toInt))
    }
    val top = cells.groupBy(identity).map(_._2.length).max
    assert(top > 100, s"top cell only $top of 200")
  }

  test("generate dispatches by name and rejects unknown kinds") {
    assert(Workload.generate("data", db, 5, 1000, 3600, 1).length === 5)
    assert(Workload.generate("gaussian", db, 5, 1000, 3600, 1).length === 5)
    assert(Workload.generate("zipf", db, 5, 1000, 3600, 1).length === 5)
    intercept[IllegalArgumentException] { Workload.generate("nope", db, 5, 1000, 3600, 1) }
  }
}
