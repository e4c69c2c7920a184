package repro.ml

import scala.util.Random

/** A minimal dense multi-layer perceptron with sigmoid activations on every
  * layer — the twin-network architecture of §7.1 (two hidden layers of
  * eight neurons, one sigmoid output). Written from scratch (the paper uses
  * PyTorch; see DESIGN.md Substitutions); gradients are verified against
  * numeric differentiation in `MLPSpec`.
  *
  * Parameters are exposed as a flat list of arrays (per layer: weights
  * row-major [out × in], then biases) so the [[Adam]] optimizer can update
  * them without knowing the architecture.
  */
final class MLP(val layerSizes: Array[Int], seed: Long = 13) extends Serializable {
  require(layerSizes.length >= 2, "need at least input and output layers")

  /** params(2l) = weights of layer l (row-major), params(2l+1) = biases. */
  val params: Array[Array[Double]] = {
    val rnd = new Random(seed)
    layerSizes.sliding(2).flatMap { case Array(in, out) =>
      val scale = math.sqrt(6.0 / (in + out)) // Xavier/Glorot uniform
      Seq(Array.fill(out * in)((rnd.nextDouble() * 2 - 1) * scale),
          Array.fill(out)(0.0))
    }.toArray
  }

  def nLayers: Int = layerSizes.length - 1

  /** Zero-filled gradient buffers with the same shape as [[params]]. */
  def zeroGrads(): Array[Array[Double]] = params.map(p => new Array[Double](p.length))

  @inline private def sigmoid(z: Double): Double = 1.0 / (1.0 + math.exp(-z))

  /** Forward pass returning all activations (index 0 = input). */
  def forward(x: Array[Double]): Array[Array[Double]] = {
    require(x.length == layerSizes(0), s"input dim ${x.length} != ${layerSizes(0)}")
    val acts = new Array[Array[Double]](nLayers + 1)
    acts(0) = x
    var l = 0
    while (l < nLayers) {
      val in = layerSizes(l); val out = layerSizes(l + 1)
      val w = params(2 * l); val b = params(2 * l + 1)
      val prev = acts(l)
      val a = new Array[Double](out)
      var o = 0
      while (o < out) {
        var z = b(o)
        val row = o * in
        var i = 0
        while (i < in) { z += w(row + i) * prev(i); i += 1 }
        a(o) = sigmoid(z)
        o += 1
      }
      acts(l + 1) = a
      l += 1
    }
    acts
  }

  /** Scalar network output (last layer must have one neuron). */
  def output(x: Array[Double]): Double = {
    val acts = forward(x)
    require(layerSizes.last == 1, "output() requires a single output neuron")
    acts(nLayers)(0)
  }

  /** Backpropagate dL/d(output activations) through the network,
    * accumulating parameter gradients into `grads` (shape of [[params]]).
    */
  def backward(acts: Array[Array[Double]], dOut: Array[Double],
               grads: Array[Array[Double]]): Unit = {
    var delta = dOut.clone()
    var l = nLayers - 1
    while (l >= 0) {
      val in = layerSizes(l); val out = layerSizes(l + 1)
      val a = acts(l + 1); val prev = acts(l)
      val w = params(2 * l)
      val gW = grads(2 * l); val gB = grads(2 * l + 1)
      // dL/dz = dL/da * a(1-a)
      val dz = new Array[Double](out)
      var o = 0
      while (o < out) { dz(o) = delta(o) * a(o) * (1 - a(o)); o += 1 }
      o = 0
      while (o < out) {
        val row = o * in
        var i = 0
        while (i < in) { gW(row + i) += dz(o) * prev(i); i += 1 }
        gB(o) += dz(o)
        o += 1
      }
      if (l > 0) {
        val next = new Array[Double](in)
        var i = 0
        while (i < in) {
          var s = 0.0
          o = 0
          while (o < out) { s += w(o * in + i) * dz(o); o += 1 }
          next(i) = s
          i += 1
        }
        delta = next
      }
      l -= 1
    }
  }
}

/** Adam optimizer (Kingma & Ba) over an MLP's parameter list. */
final class Adam(shapes: Array[Int], val lr: Double = 0.01,
                 beta1: Double = 0.9, beta2: Double = 0.999,
                 eps: Double = 1e-8) extends Serializable {
  private val m = shapes.map(new Array[Double](_))
  private val v = shapes.map(new Array[Double](_))
  private var t = 0

  def this(net: MLP, lr: Double) = this(net.params.map(_.length), lr)

  /** One update step; `grads` must match `params` in shape. */
  def step(params: Array[Array[Double]], grads: Array[Array[Double]]): Unit = {
    t += 1
    val bc1 = 1 - math.pow(beta1, t)
    val bc2 = 1 - math.pow(beta2, t)
    var a = 0
    while (a < params.length) {
      val p = params(a); val g = grads(a); val ma = m(a); val va = v(a)
      var i = 0
      while (i < p.length) {
        ma(i) = beta1 * ma(i) + (1 - beta1) * g(i)
        va(i) = beta2 * va(i) + (1 - beta2) * g(i) * g(i)
        p(i) -= lr * (ma(i) / bc1) / (math.sqrt(va(i) / bc2) + eps)
        i += 1
      }
      a += 1
    }
  }
}
