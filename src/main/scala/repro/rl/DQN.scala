package repro.rl

/** Deep Q-Network with replay memory, target network, ε-greedy exploration and
  * action masking — Section IV-C. Hyper-parameters default to the paper's
  * settings (25 hidden units, γ=0.99, lr=0.01, ε decaying to 0.1 by 0.99,
  * replay capacity 2000).
  */
final class DQN(
    val stateDim: Int,
    val nActions: Int,
    hidden: Int = 25,
    val gamma: Double = 0.99,
    val lr: Double = 0.01,
    memCapacity: Int = 2000,
    val batchSize: Int = 32,
    val targetSyncEvery: Int = 100,
    val epsMin: Double = 0.1,
    val epsDecay: Double = 0.99,
    seed: Long = 13) extends Serializable {

  val online: MLP = new MLP(stateDim, hidden, nActions, seed)
  val target: MLP = new MLP(stateDim, hidden, nActions, seed + 1)
  target.copyFrom(online)

  val memory = new ReplayMemory(memCapacity, seed + 2)
  private val rng = new java.util.Random(seed + 3)
  var epsilon: Double = 1.0
  private var steps = 0

  /** Greedy action among valid ones; ε-greedy when `explore`. `mask(a)` marks
    * valid actions; at least one action must be valid.
    */
  def selectAction(state: Array[Double], mask: Array[Boolean], explore: Boolean): Int = {
    val valid = mask.indices.filter(mask)
    require(valid.nonEmpty, "no valid action")
    if (explore && rng.nextDouble() < epsilon) valid(rng.nextInt(valid.length))
    else {
      val q = online.forward(state)
      valid.maxBy(q)
    }
  }

  def remember(t: Transition): Unit = memory.add(t)

  /** One learning step: sample a batch, regress online Q toward the Double-DQN
    * Bellman target (action argmax from the online net, value from the target
    * net — the plain max target overestimates badly with sparse rewards and
    * masked action sets), periodically sync the target network. Returns the
    * batch loss (0 when memory is smaller than the batch).
    */
  def trainStep(): Double = {
    if (memory.size < batchSize) return 0.0
    val batch = memory.sample(batchSize).map { t =>
      val tgt =
        if (t.done) t.reward
        else {
          val valid = t.nextMask.indices.filter(t.nextMask)
          if (valid.isEmpty) t.reward
          else {
            val qOnline = online.forward(t.nextState)
            val aStar = valid.maxBy(qOnline)
            t.reward + gamma * target.forward(t.nextState)(aStar)
          }
        }
      (t.state, t.action, tgt)
    }
    val loss = online.trainBatch(batch, lr)
    steps += 1
    if (steps % targetSyncEvery == 0) target.copyFrom(online)
    loss
  }

  /** Decay exploration rate (call once per episode). */
  def decayEpsilon(): Unit = epsilon = math.max(epsMin, epsilon * epsDecay)
}
