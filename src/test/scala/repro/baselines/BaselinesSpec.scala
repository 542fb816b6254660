package repro.baselines

import repro.SparkSpec
import repro.core.Model
import repro.data.TrajGen
import repro.traj.ErrorMeasures

/** Tests of the baseline catalog (the paper's 25 adaptations) and the
  * Spark-parallel E adaptation.
  */
class BaselinesSpec extends SparkSpec {

  private lazy val db = TrajGen.genLocal(TrajGen.chengdu, 8, 31)

  test("the catalog contains exactly the paper's 25 adaptations") {
    val rlts = Baselines.trainRlts(db.take(2), 0.4, episodes = 1)
    val names = Baselines.all(rlts).map(_.name)
    assert(names.length === 25)
    assert(names.count(_.startsWith("Top-Down")) === 8)
    assert(names.count(_.startsWith("Bottom-Up")) === 8)
    assert(names.count(_.startsWith("RLTS+")) === 8)
    assert(names.count(_.startsWith("Span-Search")) === 1)
    assert(names.distinct.length === 25)
    for (m <- ErrorMeasures.all; mode <- Seq("E", "W")) {
      assert(names.contains(s"Top-Down($mode,${m.name})"))
      assert(names.contains(s"Bottom-Up($mode,${m.name})"))
      assert(names.contains(s"RLTS+($mode,${m.name})"))
    }
  }

  test("without trained RLTS+ policies the catalog has the 17 static methods") {
    assert(Baselines.all().length === 17)
  }

  test("every catalog method produces a bounded valid simplification") {
    val rlts = Baselines.trainRlts(db.take(2), 0.4, episodes = 1)
    val n = Model.totalPoints(db)
    val w = (0.15 * n).toInt
    for (m <- Baselines.all(rlts)) {
      val s = m.simplify(db, w)
      // E adaptations may exceed W by rounding at most one point per trajectory
      assert(s.totalPoints <= w + db.length, m.name)
      for (tr <- db) {
        val kept = s.kept(tr.id)
        assert(kept.head === 0 && kept.last === tr.length - 1, s"${m.name} traj ${tr.id}")
        assert(kept.toSeq === kept.sorted.toSeq, m.name)
      }
    }
  }

  test("simplifyESpark(topdown) equals the driver-side per-trajectory algorithm") {
    val df = Model.toDF(spark, db.toSeq)
    val out = Baselines.simplifyESpark(df, "topdown", ErrorMeasures.SED, 0.1)
    val viaSpark = Model.collectTrajs(out)
    // same per-trajectory budget formula as simplifyESpark: max(2, r*|T|)
    val localM = db.map { tr =>
      val kept = TopDown.simplifyOne(ErrorMeasures.SED, tr, math.max(2, (0.1 * tr.length).toInt))
      repro.core.Traj(tr.id, kept.map(tr.points))
    }
    assert(viaSpark.length === localM.length)
    for ((a, b) <- viaSpark.zip(localM.sortBy(_.id)))
      assert(a.points.toSeq === b.points.toSeq, s"traj ${a.id}")
  }

  test("simplifyESpark(bottomup) keeps per-trajectory budgets") {
    val df = Model.toDF(spark, db.toSeq)
    val out = Baselines.simplifyESpark(df, "bottomup", ErrorMeasures.PED, 0.2)
    val counts = out.groupBy("traj_id").count().collect()
      .map(r => r.getLong(0) -> r.getLong(1)).toMap
    for (tr <- db)
      assert(counts(tr.id) === math.max(2, (0.2 * tr.length).toInt).toLong)
  }

  test("simplifyESpark(spansearch) requires DAD") {
    val df = Model.toDF(spark, db.take(2).toSeq)
    intercept[Exception] {
      Baselines.simplifyESpark(df, "spansearch", ErrorMeasures.SED, 0.2).collect()
    }
    val ok = Baselines.simplifyESpark(df, "spansearch", ErrorMeasures.DAD, 0.2)
    assert(ok.count() > 0)
  }

  test("simplifyESpark rejects unknown methods and bad ratios") {
    val df = Model.toDF(spark, db.take(1).toSeq)
    intercept[Exception] { Baselines.simplifyESpark(df, "magic", ErrorMeasures.SED, 0.2).collect() }
    intercept[IllegalArgumentException] { Baselines.simplifyESpark(df, "topdown", ErrorMeasures.SED, 0.0) }
  }

  test("simplified relation is a subset of the original (oracle-checked)") {
    val df = Model.toDF(spark, db.take(4).toSeq).cache()
    val out = Baselines.simplifyESpark(df, "topdown", ErrorMeasures.SED, 0.2).cache()
    // anti-join must be empty: every simplified point exists in the original
    val missing = out.join(df, Seq("traj_id", "idx", "x", "y", "t"), "left_anti")
    assert(missing.count() === 0)
    import org.apache.spark.sql.functions._
    import spark.implicits._
    val agg = out.groupBy($"traj_id" as "tid").agg(count(lit(1)) as "n")
    repro.Oracle.assertEquivalent(agg,
      "SELECT traj_id AS tid, count(*) AS n FROM simp GROUP BY traj_id",
      "simp" -> out)
    df.unpersist(); out.unpersist()
  }
}
