package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.TrajGen
import repro.baselines.{Baselines, RltsPlus}
import repro.queries._
import repro.rl.MLP
import repro.traj.ErrorMeasures.Measure

/** Shared experiment harness used by the `bench` suites (one per paper table)
  * and the `jobs/` spark-submit entrypoints.
  *
  * Scale: the paper benchmarks on ~1.5M-point databases; the repro default is
  * a ~110k-point Geolife-like database (override with env BENCH_TRAJS). The
  * temporal span is compressed to 6h so trajectories co-occur in time (the
  * paper's taxi datasets are temporally dense), which keeps kNN/similarity/
  * clustering queries non-trivial.
  */
object Experiments {

  def envInt(name: String, dflt: Int): Int = sys.env.get(name).map(_.toInt).getOrElse(dflt)

  /** Geolife-like bench profile: full-length trajectories (1412 points as in
    * Table I) with near-persistent headings (real trips are road-directed, not
    * diffusive), giving multi-km spatial extents — long relative to the 2 km
    * query boxes, the regime in which simplification actually costs query
    * recall — and a compressed span (see scaladoc).
    */
  val benchProfile: TrajGen.Profile =
    TrajGen.geolife.copy(avgLen = 1412, spanSec = 6 * 3600.0, turnSigma = 0.1)

  /** S=3 at repro scale: stop-only quality falls with cube depth (the cube
    * partition exists for efficiency), and from level 3 an adaptive descent
    * toward query-concentrated children genuinely improves F1 — the regime in
    * which Agent-Cube has something to learn, mirroring the paper's S=9/E=12
    * at 1.5M points.
    */
  val benchParams: QdtsParams = QdtsParams(startLevel = 3, maxLevel = 8, k = 2, delta = 50, leafCap = 32)

  /** Density-adaptive start level: the paper sets S so that start cubes do not
    * hold excessive numbers of points (S=9 at 1.5M points); this picks S so a
    * start cube holds ~2k points (S=3 at the 135k-point bench database) and is
    * used by the scalability sweep where N varies.
    */
  def paramsFor(nPoints: Long): QdtsParams = {
    val extra = math.ceil(math.log(nPoints / 150000.0) / math.log(8.0)).toInt
    val s = 3 + math.max(0, extra)
    benchParams.copy(startLevel = math.min(s, benchParams.maxLevel - 1))
  }

  /** Test-split database (seed disjoint from every training seed). */
  def benchDb(nTrajs: Int = envInt("BENCH_TRAJS", 100), seed: Long = 123456L,
              profile: TrajGen.Profile = benchProfile): Array[Traj] =
    TrajGen.genLocal(profile, nTrajs, seed)

  /** Train RL4QDTS agents with the bench configuration (few small databases,
    * scaled-down analogue of the paper's 12 x 500-trajectory training setup).
    */
  def trainAgents(profile: TrajGen.Profile = benchProfile,
                  workloadKind: String = "data",
                  budgetFrac: Double = 0.01,
                  seed: Long = 99): Training.TrainedAgents =
    Training.train(Training.TrainConfig(
      profile = profile,
      nDbs = envInt("BENCH_TRAIN_DBS", 12),
      trajsPerDb = envInt("BENCH_TRAIN_TRAJS", 50),
      episodesPerDb = envInt("BENCH_TRAIN_EPISODES", 10),
      budgetFrac = budgetFrac,
      nQueries = 100,
      querySizeXY = 2000.0,
      workloadKind = workloadKind,
      params = benchParams,
      trainStepsPerWindow = 16,
      seed = seed))

  /** Train the RLTS+ baselines (one policy per measure) on a training split. */
  def trainRltsBaselines(profile: TrajGen.Profile = benchProfile, seed: Long = 555): Map[Measure, RltsPlus] = {
    val trainDb = TrajGen.genLocal(profile, envInt("BENCH_RLTS_TRAJS", 12), seed)
    Baselines.trainRlts(trainDb, budgetFrac = 0.05, episodes = 1)
  }

  /** Per-task F1 of one simplified database against the original. */
  final case class TaskF1(range: Double, knnEdr: Double, knnEmbed: Double,
                          similarity: Double, clustering: Double) {
    def fmt: String = f"range=$range%.3f knnEDR=$knnEdr%.3f knnEmb=$knnEmbed%.3f " +
      f"sim=$similarity%.3f clus=$clustering%.3f"
  }

  /** Fixed query workloads + their ground truths on the original database;
    * `evaluate` scores any simplified database against them (Section III-B
    * quality measures). Built once per (db, distribution) and reused across
    * methods so every method faces identical queries.
    */
  final class Evaluator(val db: Array[Traj], workloadKind: String, seed: Long = 2024,
                        nRange: Int = 100, nKnn: Int = 8, nSim: Int = 10,
                        knnK: Int = 3, clusterTrajs: Int = 150) {

    private val (xmin, xmax, ymin, ymax, tmin, tmax) = Model.bounds(db)
    private val span = math.max(tmax - tmin, 1.0)

    // --- range queries (paper: 2km x 2km x 7 days ~= the whole span) ---
    // rejection-sample to non-empty ground truths: data-distribution queries
    // are non-empty by construction, and empty-result queries score F1=1 for
    // every method, only diluting the measure
    val rangeQs: Array[Box] = {
      val raw = Workload.generate(workloadKind, db, nRange * 4, 2000.0, span, seed)
      val nonEmpty = raw.filter(q => RangeQuery.inMemory(db, q).nonEmpty)
      (if (nonEmpty.length >= nRange) nonEmpty else raw).take(nRange)
    }
    private val rangeGt: Array[Set[Long]] = rangeQs.map(RangeQuery.inMemory(db, _))

    // --- kNN queries: sampled query trajectories over their own windows ---
    private val rng = new java.util.Random(seed + 1)
    private val knnIdx: Array[Int] = Array.fill(nKnn)(rng.nextInt(db.length))
    private val knnWin: Array[(Double, Double)] =
      knnIdx.map(i => (db(i).points.head.t, db(i).points.last.t))
    private val edrEps = 2000.0
    private val knnGtEdr: Array[Seq[Long]] = knnIdx.zip(knnWin).map { case (i, (ts, te)) =>
      KnnQuery.knn(db, db(i), ts, te, knnK, KnnQuery.EDR, edrEps)
    }
    private val knnGtEmb: Array[Seq[Long]] = knnIdx.zip(knnWin).map { case (i, (ts, te)) =>
      KnnQuery.knn(db, db(i), ts, te, knnK, KnnQuery.Embed)
    }

    // --- similarity queries (paper: 5km threshold) ---
    private val simIdx: Array[Int] = Array.fill(nSim)(rng.nextInt(db.length))
    private val simDelta = 5000.0
    private val simGt: Array[Set[Long]] = simIdx.map { i =>
      val q = db(i)
      SimilarityQuery.similar(db, q, q.points.head.t, q.points.last.t, simDelta)
    }

    // --- clustering (TRACLUS) on a fixed subset ---
    private val cluIds: Set[Long] = db.take(clusterTrajs).map(_.id).toSet
    private val cluTol = 100.0; private val cluEps = 1500.0; private val cluMin = 3
    private val cluGt: Set[(Long, Long)] =
      Traclus.clusterPairs(db.filter(t => cluIds(t.id)), cluTol, cluEps, cluMin)

    /** Number of non-trivial ground-truth results (bench sanity reporting). */
    def gtSummary: String =
      s"rangeGT(nonempty)=${rangeGt.count(_.nonEmpty)}/$nRange " +
        s"simGT(nonempty)=${simGt.count(_.nonEmpty)}/$nSim clusterPairsGT=${cluGt.size}"

    def evaluate(s: SimpleDB): TaskF1 = {
      val simp = s.materialise(db)
      val range = Quality.mean(rangeQs.indices.map(i =>
        Quality.f1(rangeGt(i), RangeQuery.inMemory(simp, rangeQs(i)))))
      val kEdr = Quality.mean(knnIdx.indices.map { j =>
        val (ts, te) = knnWin(j)
        Quality.knnF1(knnGtEdr(j),
          KnnQuery.knn(simp, db(knnIdx(j)), ts, te, knnK, KnnQuery.EDR, edrEps))
      })
      val kEmb = Quality.mean(knnIdx.indices.map { j =>
        val (ts, te) = knnWin(j)
        Quality.knnF1(knnGtEmb(j),
          KnnQuery.knn(simp, db(knnIdx(j)), ts, te, knnK, KnnQuery.Embed))
      })
      val sim = Quality.mean(simIdx.indices.map { j =>
        val q = db(simIdx(j))
        Quality.f1(simGt(j),
          SimilarityQuery.similar(simp, q, q.points.head.t, q.points.last.t, simDelta))
      })
      val clu = Quality.f1(cluGt,
        Traclus.clusterPairs(simp.filter(t => cluIds(t.id)), cluTol, cluEps, cluMin))
      TaskF1(range, kEdr, kEmb, sim, clu)
    }

    /** Range-query-only evaluation (fast path for sweeps/ablations). */
    def rangeF1(s: SimpleDB): Double = {
      val simp = s.materialise(db)
      Quality.mean(rangeQs.indices.map(i =>
        Quality.f1(rangeGt(i), RangeQuery.inMemory(simp, rangeQs(i)))))
    }

    /** Mean SED deformation over trajectories returned by the range workload
      * (the Fig. 7 metric).
      */
    def meanSedOfReturned(s: SimpleDB): Double = {
      val hit = rangeGt.flatten.toSet
      val ts = db.filter(t => hit(t.id))
      if (ts.isEmpty) 0.0
      else Quality.mean(ts.toSeq.map(t =>
        repro.traj.ErrorMeasures.meanSed(t, s.kept(t.id))))
    }
  }

  /** Run RL4QDTS with trained nets; convenience for benches. */
  def runRl4qdts(db: Array[Traj], w: Int, ev: Evaluator, agents: Training.TrainedAgents,
                 workloadKind: String, runs: Int, seed: Long = 9999,
                 variant: RL4QDTS.Variant = RL4QDTS.Variant()): Seq[SimpleDB] = {
    val (_, _, _, _, tmin, tmax) = Model.bounds(db)
    // inference-time synthetic workload (not the evaluation queries!)
    val wl = Workload.generate(workloadKind, db, 100, 2000.0, math.max(tmax - tmin, 1.0), seed + 1)
    RL4QDTS.simplifyRuns(db, w, wl, agents.cubeNet, agents.pointNet, benchParams,
      runs, seed, variant)
  }

  def time[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  /** Markdown-ish fixed-width table printer. */
  def printTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmtRow(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    val sb = new StringBuilder
    sb.append(s"\n=== $title ===\n")
    sb.append(fmtRow(header)).append('\n').append(sep).append('\n')
    rows.foreach(r => sb.append(fmtRow(r)).append('\n'))
    val s = sb.toString
    println(s)
    s
  }
}
