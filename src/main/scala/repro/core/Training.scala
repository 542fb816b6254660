package repro.core

import scala.collection.mutable.ArrayBuffer
import repro.data.TrajGen
import repro.queries.Workload
import repro.rl.{DQN, Transition}

/** Policy learning for RL4QDTS (Section IV-C / V-A): deep Q-learning with
  * replay memory over episodes of collective simplification on sampled
  * sub-databases. Both agents share the delayed reward
  * `R = diff(Q(D),Q(D')) − diff(Q(D),Q(D''))` measured every Δ insertions on
  * a synthetic range-query workload (Eq. 10); within a window the reward is
  * shared by every transition of both agents, matching the paper.
  */
object Training {

  final case class TrainConfig(
      profile: TrajGen.Profile = TrajGen.geolife,
      nDbs: Int = 3,              // paper: 12 databases
      trajsPerDb: Int = 60,       // paper: 500 (4000 for Chengdu)
      episodesPerDb: Int = 2,     // paper: 5
      budgetFrac: Double = 0.02,
      nQueries: Int = 100,
      querySizeXY: Double = 2000.0,
      queryTFrac: Double = 1.0,   // temporal query extent as fraction of the span
      workloadKind: String = "data",
      params: QdtsParams = QdtsParams(),
      rewardScale: Double = 100.0, // F1 deltas per window are small; scale for gradient signal
      trainStepsPerWindow: Int = 8,
      seed: Long = 99)

  /** The two learners plus the best validation snapshot seen during training
    * ("the best model is chosen during training", Section V-A). Inference uses
    * the snapshot; the raw online nets remain accessible for analysis.
    */
  final case class TrainedAgents(cube: DQN, point: DQN) {
    var bestCube: Option[repro.rl.NetWeights] = None
    var bestPoint: Option[repro.rl.NetWeights] = None
    var bestValF1: Double = -1.0
    def cubeNet: repro.rl.MLP = bestCube.map(repro.rl.MLP.fromWeights).getOrElse(cube.online)
    def pointNet: repro.rl.MLP = bestPoint.map(repro.rl.MLP.fromWeights).getOrElse(point.online)
  }

  /** Fresh (untrained) agents with the paper's architecture: Agent-Cube
    * 16→25(tanh)→9, Agent-Point 2K→25(tanh)→K.
    */
  def makeAgents(params: QdtsParams, seed: Long = 13): TrainedAgents =
    TrainedAgents(
      // γ slightly below the paper's 0.99 for Agent-Cube: with sparse rewards
      // the bootstrap max overestimates, and a mild discount keeps pointless
      // descents from dominating the stop action
      cube = new DQN(stateDim = 16, nActions = 9, gamma = 0.95, seed = seed),
      point = new DQN(stateDim = 2 * params.k, nActions = params.k, seed = seed + 1))

  /** Train both agents; returns them (the caller snapshots `cubeNet`/`pointNet`
    * for inference).
    */
  def train(cfg: TrainConfig): TrainedAgents = {
    val agents = makeAgents(cfg.params, cfg.seed)
    val rng = new java.util.Random(cfg.seed)

    // held-out validation database for best-model selection
    val valDb = TrajGen.genLocal(cfg.profile, math.max(10, cfg.trajsPerDb / 2), cfg.seed - 7)
    val valN = Model.totalPoints(valDb)
    val valBudget = math.max(2 * valDb.length + 5, math.round(cfg.budgetFrac * valN).toInt)
    val (_, _, _, _, vtmin, vtmax) = Model.bounds(valDb)
    val valWl = repro.queries.Workload.generate(cfg.workloadKind, valDb, cfg.nQueries,
      cfg.querySizeXY, math.max((vtmax - vtmin) * cfg.queryTFrac, 1.0), cfg.seed - 8)
    val valGt = valWl.map(repro.queries.RangeQuery.inMemory(valDb, _))

    def validate(): Unit = {
      val simp = RL4QDTS
        .simplify(valDb, valBudget, valWl, agents.cube.online, agents.point.online,
          cfg.params, seed = 17)
        .materialise(valDb)
      val f1 = repro.queries.Quality.mean(valWl.indices.map(i =>
        repro.queries.Quality.f1(valGt(i), repro.queries.RangeQuery.inMemory(simp, valWl(i)))))
      if (f1 > agents.bestValF1) {
        agents.bestValF1 = f1
        agents.bestCube = Some(agents.cube.online.snapshot)
        agents.bestPoint = Some(agents.point.online.snapshot)
      }
    }
    // transitions of the current Δ-window: (state, action, reward, nextState,
    // nextMask, done) for Agent-Cube and (state, action, reward, mask) for
    // Agent-Point. Only the *terminal* transition of a cube traversal carries
    // a reward — a traversal leads to exactly one insertion, so paying every
    // descend step would double-count it and bias the policy toward descending.
    val pendCube = ArrayBuffer.empty[(Array[Double], Int, Double, Array[Double], Array[Boolean], Boolean)]
    val pendPoint = ArrayBuffer.empty[(Array[Double], Int, Double, Array[Boolean])]

    for (dbIdx <- 0 until cfg.nDbs) {
      val db = TrajGen.genLocal(cfg.profile, cfg.trajsPerDb, cfg.seed + 1000L * (dbIdx + 1))
      val (_, _, _, _, tmin, tmax) = Model.bounds(db)
      val sizeT = math.max((tmax - tmin) * cfg.queryTFrac, 1.0)
      val workload = Workload.generate(cfg.workloadKind, db, cfg.nQueries,
        cfg.querySizeXY, sizeT, cfg.seed + dbIdx)
      val n = Model.totalPoints(db)
      val budget = math.max(2 * db.length, math.round(cfg.budgetFrac * n).toInt)

      for (_ <- 0 until cfg.episodesPerDb) {
        val env = new QdtsEnv(db, workload, cfg.params)
        var sinceWindow = 0
        val target = math.min(budget.toLong, n).toInt

        def flushWindow(): Unit = {
          // move the window's transitions to replay and take learning steps —
          // the paper's Δ-cadence of "perform the queries, acquire rewards"
          pendCube.foreach { case (s, a, r, s2, m2, done) =>
            agents.cube.remember(Transition(s, a, r, s2, m2, done))
          }
          pendPoint.foreach { case (s, a, r, m) =>
            agents.point.remember(Transition(s, a, r, new Array[Double](s.length), m, done = true))
          }
          pendCube.clear(); pendPoint.clear()
          var i = 0
          while (i < cfg.trainStepsPerWindow) {
            agents.cube.trainStep(); agents.point.trainStep(); i += 1
          }
          // ε decays per reward window (the paper's 0.99 decay is per update,
          // not per episode — episodes here are far shorter than the paper's)
          agents.cube.decayEpsilon()
          agents.point.decayEpsilon()
          sinceWindow = 0
        }

        while (env.insertedCount < target) {
          // ---- Agent-Cube traversal (ε-greedy) ----
          var node = env.sampleStartNode(rng)
          val steps = ArrayBuffer.empty[(Array[Double], Int, Array[Boolean])]
          var stop = false
          while (!stop && !node.isLeaf) {
            val s = env.cubeState(node)
            val mask = env.cubeMask(node)
            // stop-balanced ε-exploration: uniform random over 9 actions
            // explores "stop" only 1/9 of the time, starving the terminal
            // action of experience; sample it half the time instead
            val a =
              if (rng.nextDouble() < agents.cube.epsilon) {
                if (rng.nextBoolean()) 8
                else {
                  val kids = (0 until 8).filter(mask)
                  if (kids.isEmpty) 8 else kids(rng.nextInt(kids.length))
                }
              } else agents.cube.selectAction(s, mask, explore = false)
            steps += ((s, a, mask))
            if (a == 8) stop = true else node = node.children(a)
          }
          // ---- Agent-Point (ε-greedy) ----
          val cands = env.candidates(node)
          if (cands.nonEmpty) {
            val (ps, pmask) = env.pointState(node, cands)
            val pa = agents.point.selectAction(ps, pmask, explore = true)
            val c = cands(math.min(pa, cands.length - 1))
            // this insertion's own F1 improvement; the window's rewards
            // telescope to the Eq. 10 window reward, so the accumulated
            // objective of Eq. 11 is unchanged, but each decision of both
            // agents is credited with the gain it actually produced
            val before = env.diff
            env.insertPoint(c.trajIdx, c.ptIdx)
            val r = (before - env.diff) * cfg.rewardScale
            pendPoint += ((ps, pa, r, pmask))
            // chain the traversal's transitions; only the terminal one (the
            // stop that led to this insertion) carries the reward
            var i = 0
            while (i < steps.length) {
              val (s, a, _) = steps(i)
              if (i + 1 < steps.length) {
                val (s2, _, m2) = steps(i + 1)
                pendCube += ((s, a, 0.0, s2, m2, false))
              } else {
                pendCube += ((s, a, r, new Array[Double](16), Array.fill(9)(false), true))
              }
              i += 1
            }
            sinceWindow += 1
            if (sinceWindow >= cfg.params.delta) flushWindow()
          }
        }
        if (sinceWindow > 0 || pendCube.nonEmpty || pendPoint.nonEmpty) flushWindow()
        validate()
      }
    }
    agents
  }
}
