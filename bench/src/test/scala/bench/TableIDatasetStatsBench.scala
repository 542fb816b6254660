package bench

import repro.SparkSpec
import repro.data.TrajGen
import repro.exp.Experiments

/** Table I — dataset statistics. The paper reports the statistics of its four
  * real datasets; we report the statistics of the synthetic stand-in profiles
  * (generated with Spark, aggregated with Spark SQL window functions) next to
  * the paper's numbers. The repro preserves the *relative* structure: per-
  * dataset ordering of trajectory counts, lengths, sampling rates and segment
  * lengths (absolute counts are scaled down ~100x; see DESIGN.md).
  */
class TableIDatasetStatsBench extends SparkSpec {

  // paper's Table I rows: (name, #trajs, total points, pts/traj, sampling, avg seg len)
  private val paper = Seq(
    ("Geolife", 17621L, 24876978L, 1412.0, "1s~5s", 9.96),
    ("T-Drive", 10359L, 17740902L, 1713.0, "177s", 623.0),
    ("Chengdu", 179756L, 32151865L, 178.0, "2s~4s", 25.0),
    ("OSM", 513380L, 2913478785L, 5675.0, "53.5s", 180.0))

  private val reproN = Map("geolife" -> 300, "tdrive" -> 200, "chengdu" -> 800, "osm" -> 200)

  test("Table I: generated dataset statistics vs paper") {
    val rows = Seq("geolife", "tdrive", "chengdu", "osm").zip(paper).map {
      case (name, (pName, pTr, pPts, pAvg, pSamp, pSeg)) =>
        val profile = TrajGen.profiles(name)
        val df = TrajGen.genDF(spark, profile, reproN(name), seed = 42).cache()
        val s = TrajGen.stats(df)
        df.unpersist()
        Seq(pName,
          s"$pTr / ${s.nTrajs}",
          s"$pPts / ${s.totalPoints}",
          f"$pAvg%.0f / ${s.avgPtsPerTraj}%.0f",
          f"$pSamp / ${s.avgSamplingSec}%.1fs",
          f"$pSeg%.1f / ${s.avgSegmentMeters}%.1f")
    }
    val out = Experiments.printTable("Table I — dataset statistics (paper / repro)",
      Seq("dataset", "#trajs", "total pts", "pts/traj", "sampling", "seg len (m)"), rows)
    BenchShared.record(out)

    // shape assertions: orderings of the paper's Table I hold in the repro
    val stats = Seq("geolife", "tdrive", "chengdu", "osm").map { n =>
      n -> TrajGen.stats(TrajGen.genDF(spark, TrajGen.profiles(n), reproN(n), 42))
    }.toMap
    assert(stats("chengdu").avgPtsPerTraj < stats("geolife").avgPtsPerTraj)
    assert(stats("osm").avgPtsPerTraj > stats("geolife").avgPtsPerTraj)
    assert(stats("tdrive").avgSamplingSec > stats("geolife").avgSamplingSec)
    assert(stats("tdrive").avgSegmentMeters > stats("chengdu").avgSegmentMeters)
    assert(stats("geolife").avgSegmentMeters < stats("chengdu").avgSegmentMeters)
  }

  test("Table I: sampling-rate targets hit within 20%") {
    for ((name, profile) <- TrajGen.profiles) {
      val s = TrajGen.stats(TrajGen.genDF(spark, profile, 50, 7))
      assert(math.abs(s.avgSamplingSec - profile.samplingSec) < profile.samplingSec * 0.2,
        s"$name sampling ${s.avgSamplingSec} vs ${profile.samplingSec}")
    }
  }

  test("Table I: aggregates match the DuckDB oracle") {
    val df = TrajGen.genDF(spark, TrajGen.profiles("chengdu"), 60, 42).cache()
    import org.apache.spark.sql.functions._
    import spark.implicits._
    val agg = df.groupBy($"traj_id" as "tid").agg(count(lit(1)) as "n")
    repro.Oracle.assertEquivalent(agg,
      "SELECT traj_id AS tid, count(*) AS n FROM pts GROUP BY traj_id",
      "pts" -> df)
    df.unpersist()
  }
}
