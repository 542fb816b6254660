package repro.rl

/** Serializable snapshot of MLP weights (broadcast to Spark executors for
  * distributed inference).
  */
final case class NetWeights(
    inDim: Int, hidden: Int, outDim: Int,
    w1: Array[Array[Double]], b1: Array[Double],
    w2: Array[Array[Double]], b2: Array[Double]) extends Serializable

/** Two-layer feed-forward network: `in -> hidden (tanh) -> out (linear)` —
  * the exact architecture the paper uses for both agents (25 hidden units).
  * Implemented from scratch (no ML library in the sealed image) with an Adam
  * optimiser and mean-squared-error loss on the Q-value of the taken action.
  */
final class MLP(val inDim: Int, val hidden: Int, val outDim: Int, seed: Long = 7)
    extends Serializable {

  private val rng = new java.util.Random(seed)
  private def xavier(fanIn: Int, fanOut: Int): Double =
    rng.nextGaussian() * math.sqrt(2.0 / (fanIn + fanOut))

  val w1: Array[Array[Double]] = Array.fill(hidden, inDim)(xavier(inDim, hidden))
  val b1: Array[Double] = Array.fill(hidden)(0.0)
  val w2: Array[Array[Double]] = Array.fill(outDim, hidden)(xavier(hidden, outDim))
  val b2: Array[Double] = Array.fill(outDim)(0.0)

  // Adam state
  private val mW1 = Array.fill(hidden, inDim)(0.0); private val vW1 = Array.fill(hidden, inDim)(0.0)
  private val mB1 = Array.fill(hidden)(0.0); private val vB1 = Array.fill(hidden)(0.0)
  private val mW2 = Array.fill(outDim, hidden)(0.0); private val vW2 = Array.fill(outDim, hidden)(0.0)
  private val mB2 = Array.fill(outDim)(0.0); private val vB2 = Array.fill(outDim)(0.0)
  private var adamT = 0
  private val beta1 = 0.9; private val beta2 = 0.999; private val adamEps = 1e-8

  /** Hidden activations for input x. */
  def hiddenOut(x: Array[Double]): Array[Double] = {
    require(x.length == inDim, s"input dim ${x.length} != $inDim")
    val h = new Array[Double](hidden)
    var j = 0
    while (j < hidden) {
      var s = b1(j); val w = w1(j)
      var i = 0
      while (i < inDim) { s += w(i) * x(i); i += 1 }
      h(j) = math.tanh(s)
      j += 1
    }
    h
  }

  /** Q-values for input x. */
  def forward(x: Array[Double]): Array[Double] = {
    val h = hiddenOut(x)
    val out = new Array[Double](outDim)
    var k = 0
    while (k < outDim) {
      var s = b2(k); val w = w2(k)
      var j = 0
      while (j < hidden) { s += w(j) * h(j); j += 1 }
      out(k) = s
      k += 1
    }
    out
  }

  /** One Adam step on a batch of (state, action, tdTarget): minimises
    * mean (Q(s)(a) - target)^2. Returns the batch loss.
    */
  def trainBatch(batch: Seq[(Array[Double], Int, Double)], lr: Double): Double = {
    val gW1 = Array.fill(hidden, inDim)(0.0); val gB1 = Array.fill(hidden)(0.0)
    val gW2 = Array.fill(outDim, hidden)(0.0); val gB2 = Array.fill(outDim)(0.0)
    var loss = 0.0
    val bs = batch.size.toDouble
    for ((x, a, target) <- batch) {
      val h = hiddenOut(x)
      var qa = b2(a)
      var j = 0
      while (j < hidden) { qa += w2(a)(j) * h(j); j += 1 }
      val err = qa - target
      loss += err * err / bs
      val dq = 2.0 * err / bs
      // output layer grads + backprop into hidden
      val dh = new Array[Double](hidden)
      j = 0
      while (j < hidden) {
        gW2(a)(j) += dq * h(j)
        dh(j) = dq * w2(a)(j) * (1 - h(j) * h(j)) // tanh'
        j += 1
      }
      gB2(a) += dq
      j = 0
      while (j < hidden) {
        val d = dh(j)
        if (d != 0.0) {
          var i = 0
          val w = gW1(j)
          while (i < inDim) { w(i) += d * x(i); i += 1 }
          gB1(j) += d
        }
        j += 1
      }
    }
    adamT += 1
    val bc1 = 1 - math.pow(beta1, adamT); val bc2 = 1 - math.pow(beta2, adamT)
    @inline def upd(p: Array[Double], g: Array[Double], m: Array[Double], v: Array[Double]): Unit = {
      var i = 0
      while (i < p.length) {
        m(i) = beta1 * m(i) + (1 - beta1) * g(i)
        v(i) = beta2 * v(i) + (1 - beta2) * g(i) * g(i)
        p(i) -= lr * (m(i) / bc1) / (math.sqrt(v(i) / bc2) + adamEps)
        i += 1
      }
    }
    var j = 0
    while (j < hidden) { upd(w1(j), gW1(j), mW1(j), vW1(j)); j += 1 }
    upd(b1, gB1, mB1, vB1)
    var k = 0
    while (k < outDim) { upd(w2(k), gW2(k), mW2(k), vW2(k)); k += 1 }
    upd(b2, gB2, mB2, vB2)
    loss
  }

  /** Copy weights from another network (target-network sync). */
  def copyFrom(o: MLP): Unit = {
    require(o.inDim == inDim && o.hidden == hidden && o.outDim == outDim)
    var j = 0
    while (j < hidden) { Array.copy(o.w1(j), 0, w1(j), 0, inDim); j += 1 }
    Array.copy(o.b1, 0, b1, 0, hidden)
    var k = 0
    while (k < outDim) { Array.copy(o.w2(k), 0, w2(k), 0, hidden); k += 1 }
    Array.copy(o.b2, 0, b2, 0, outDim)
  }

  def snapshot: NetWeights =
    NetWeights(inDim, hidden, outDim, w1.map(_.clone()), b1.clone(), w2.map(_.clone()), b2.clone())
}

object MLP {
  /** Rebuild a network from a weight snapshot (executor-side inference). */
  def fromWeights(w: NetWeights): MLP = {
    val n = new MLP(w.inDim, w.hidden, w.outDim)
    var j = 0
    while (j < w.hidden) { Array.copy(w.w1(j), 0, n.w1(j), 0, w.inDim); j += 1 }
    Array.copy(w.b1, 0, n.b1, 0, w.hidden)
    var k = 0
    while (k < w.outDim) { Array.copy(w.w2(k), 0, n.w2(k), 0, w.hidden); k += 1 }
    Array.copy(w.b2, 0, n.b2, 0, w.outDim)
    n
  }
}
