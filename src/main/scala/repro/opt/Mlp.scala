package repro.opt

/** Small dense neural network with tanh hidden layers, used by the DDPG
  * actor and critic (paper Sec 5.3). Supports backprop to both parameters
  * and *inputs* — the latter is required for the deterministic policy
  * gradient (∂Q/∂a flows through the critic into the actor).
  * Optimized with Adam.
  */
final class Mlp(val sizes: Array[Int], outTanh: Boolean, seed: Long) {

  private val rnd = new scala.util.Random(seed)
  private val L = sizes.length - 1

  val w: Array[Array[Array[Double]]] = Array.tabulate(L) { l =>
    val fanIn = sizes(l)
    Array.fill(sizes(l + 1), fanIn)((rnd.nextDouble() * 2 - 1) / math.sqrt(fanIn))
  }
  val b: Array[Array[Double]] = Array.tabulate(L)(l => Array.fill(sizes(l + 1))(0.0))

  // Adam state
  private val mw = w.map(_.map(_.map(_ => 0.0)))
  private val vw = w.map(_.map(_.map(_ => 0.0)))
  private val mb = b.map(_.map(_ => 0.0))
  private val vb = b.map(_.map(_ => 0.0))
  private var t = 0

  /** Activations per layer from the last forward pass (index 0 = input). */
  final case class Trace(acts: Array[Array[Double]]) { def output: Array[Double] = acts.last }

  def forward(x: Array[Double]): Trace = {
    val acts = new Array[Array[Double]](L + 1)
    acts(0) = x
    var l = 0
    while (l < L) {
      val in = acts(l)
      val out = new Array[Double](sizes(l + 1))
      var i = 0
      while (i < out.length) {
        var s = b(l)(i)
        val wi = w(l)(i)
        var j = 0
        while (j < in.length) { s += wi(j) * in(j); j += 1 }
        out(i) = if (l < L - 1 || outTanh) math.tanh(s) else s
        i += 1
      }
      acts(l + 1) = out
      l += 1
    }
    Trace(acts)
  }

  def apply(x: Array[Double]): Array[Double] = forward(x).output

  /** Backpropagate an output gradient; accumulates parameter gradients into
    * (gw, gb) and returns the gradient w.r.t. the input.
    */
  def backward(tr: Trace, gradOut: Array[Double],
               gw: Array[Array[Array[Double]]], gb: Array[Array[Double]]): Array[Double] = {
    var delta = gradOut.clone()
    var l = L - 1
    while (l >= 0) {
      val act = tr.acts(l + 1)
      val in = tr.acts(l)
      // tanh derivative on all but a linear output layer
      if (l < L - 1 || outTanh) {
        var i = 0
        while (i < delta.length) { delta(i) *= (1.0 - act(i) * act(i)); i += 1 }
      }
      val gIn = new Array[Double](in.length)
      var i = 0
      while (i < delta.length) {
        val wi = w(l)(i)
        val gwi = gw(l)(i)
        val d = delta(i)
        gb(l)(i) += d
        var j = 0
        while (j < in.length) { gwi(j) += d * in(j); gIn(j) += wi(j) * d; j += 1 }
        i += 1
      }
      delta = gIn
      l -= 1
    }
    delta
  }

  def zeroGrads(): (Array[Array[Array[Double]]], Array[Array[Double]]) =
    (w.map(_.map(_.map(_ => 0.0))), b.map(_.map(_ => 0.0)))

  def adamStep(gw: Array[Array[Array[Double]]], gb: Array[Array[Double]], lr: Double): Unit = {
    t += 1
    val b1 = 0.9; val b2 = 0.999; val eps = 1e-8
    val c1 = 1 - math.pow(b1, t); val c2 = 1 - math.pow(b2, t)
    for (l <- 0 until L; i <- w(l).indices) {
      for (j <- w(l)(i).indices) {
        val g = gw(l)(i)(j)
        mw(l)(i)(j) = b1 * mw(l)(i)(j) + (1 - b1) * g
        vw(l)(i)(j) = b2 * vw(l)(i)(j) + (1 - b2) * g * g
        w(l)(i)(j) -= lr * (mw(l)(i)(j) / c1) / (math.sqrt(vw(l)(i)(j) / c2) + eps)
      }
      val g = gb(l)(i)
      mb(l)(i) = b1 * mb(l)(i) + (1 - b1) * g
      vb(l)(i) = b2 * vb(l)(i) + (1 - b2) * g * g
      b(l)(i) -= lr * (mb(l)(i) / c1) / (math.sqrt(vb(l)(i) / c2) + eps)
    }
  }

  /** Parameter count (for the Table-10 model-size row). */
  def paramCount: Int = w.map(_.map(_.length).sum).sum + b.map(_.length).sum

  /** θ' ← τθ + (1−τ)θ' soft update from `src` into this (target) network. */
  def softUpdateFrom(src: Mlp, tau: Double): Unit = {
    for (l <- 0 until L; i <- w(l).indices) {
      for (j <- w(l)(i).indices)
        w(l)(i)(j) = tau * src.w(l)(i)(j) + (1 - tau) * w(l)(i)(j)
      b(l)(i) = tau * src.b(l)(i) + (1 - tau) * b(l)(i)
    }
  }

  def copyFrom(src: Mlp): Unit = softUpdateFrom(src, 1.0)
}
