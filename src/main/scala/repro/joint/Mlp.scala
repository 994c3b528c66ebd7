package repro.joint

import scala.util.Random

/** The joint representation model (§4.2): a deep multi-layer network mapping
  * a DE's 200-d input encoding (metadata ‖ content solo embeddings) to a
  * 100-d joint embedding, trained with the triplet margin loss of Eq. 1.
  *
  * The paper trains it in PyTorch; this is a from-scratch implementation —
  * tanh hidden layer, linear output, SGD over triplet gradients. Squared
  * Euclidean distance is used inside the loss (the gradients are then
  * linear in the embedding differences).
  */
final class Mlp(val inDim: Int = 200, val hiddenDim: Int = 150, val outDim: Int = 100, seed: Long = 5L) {

  private val rnd = new Random(seed)
  private def init(rows: Int, cols: Int): Array[Array[Double]] = {
    val s = math.sqrt(6.0 / (rows + cols))
    Array.fill(rows, cols)((rnd.nextDouble() * 2 - 1) * s)
  }
  val w1: Array[Array[Double]] = init(hiddenDim, inDim)
  val b1: Array[Double] = new Array[Double](hiddenDim)
  val w2: Array[Array[Double]] = init(outDim, hiddenDim)
  val b2: Array[Double] = new Array[Double](outDim)

  /** Forward pass: hidden activations and output embedding. */
  def forward(x: Array[Double]): (Array[Double], Array[Double]) = {
    val h = new Array[Double](hiddenDim)
    var i = 0
    while (i < hiddenDim) {
      var z = b1(i); val row = w1(i)
      var j = 0
      while (j < inDim) { z += row(j) * x(j); j += 1 }
      h(i) = math.tanh(z)
      i += 1
    }
    val out = new Array[Double](outDim)
    i = 0
    while (i < outDim) {
      var z = b2(i); val row = w2(i)
      var j = 0
      while (j < hiddenDim) { z += row(j) * h(j); j += 1 }
      out(i) = z
      i += 1
    }
    (h, out)
  }

  def embed(x: Array[Double]): Array[Double] = forward(x)._2

  /** Squared Euclidean distance between two embeddings. */
  def dist2(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  /** Triplet loss of Eq. 1 for (anchor, positive, negative) inputs. */
  def tripletLoss(a: Array[Double], p: Array[Double], n: Array[Double], margin: Double): Double = {
    val fa = embed(a); val fp = embed(p); val fn = embed(n)
    math.max(0.0, margin + dist2(fa, fp) - dist2(fa, fn))
  }

  /** One SGD step on a triplet; returns the (pre-update) loss. Gradients:
    * ∂L/∂f(a) = 2(f(n)−f(p)), ∂L/∂f(p) = −2(f(a)−f(p)), ∂L/∂f(n) = 2(f(a)−f(n)).
    */
  def tripletStep(a: Array[Double], p: Array[Double], n: Array[Double],
      margin: Double, lr: Double): Double = {
    val (ha, fa) = forward(a)
    val (hp, fp) = forward(p)
    val (hn, fn) = forward(n)
    val loss = margin + dist2(fa, fp) - dist2(fa, fn)
    if (loss <= 0) return 0.0

    val ga = new Array[Double](outDim)
    val gp = new Array[Double](outDim)
    val gn = new Array[Double](outDim)
    var i = 0
    while (i < outDim) {
      ga(i) = 2 * (fn(i) - fp(i))
      gp(i) = -2 * (fa(i) - fp(i))
      gn(i) = 2 * (fa(i) - fn(i))
      i += 1
    }
    backprop(a, ha, ga, lr)
    backprop(p, hp, gp, lr)
    backprop(n, hn, gn, lr)
    loss
  }

  /** Backprop one sample's output-gradient through both layers (SGD update). */
  private def backprop(x: Array[Double], h: Array[Double], gOut: Array[Double], lr: Double): Unit = {
    // grad wrt hidden, plus W2/b2 update
    val gh = new Array[Double](hiddenDim)
    var i = 0
    while (i < outDim) {
      val g = gOut(i); val row = w2(i)
      var j = 0
      while (j < hiddenDim) {
        gh(j) += row(j) * g
        row(j) -= lr * g * h(j)
        j += 1
      }
      b2(i) -= lr * g
      i += 1
    }
    // through tanh, W1/b1 update
    i = 0
    while (i < hiddenDim) {
      val g = gh(i) * (1 - h(i) * h(i))
      val row = w1(i)
      var j = 0
      while (j < inDim) { row(j) -= lr * g * x(j); j += 1 }
      b1(i) -= lr * g
      i += 1
    }
  }
}
