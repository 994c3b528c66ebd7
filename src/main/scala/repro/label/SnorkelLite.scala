package repro.label

import scala.util.Random

/** Snorkel-substitute weak-supervision models (§4.1).
  *
  * The *generative* model is a binary Dawid–Skene EM: it estimates each
  * labeling function's accuracy purely from the agreements/disagreements of
  * the vote matrix and produces a probabilistic label per (doc, col) pair by
  * accuracy-weighted vote combination. The *discriminator* is a logistic
  * regression over the pair's underlying similarity features, trained on the
  * probabilistic labels so the final relatedness degree generalises beyond
  * the pairs the LFs happened to label.
  */
object SnorkelLite {

  /** One labeled data point: a (doc, col) pair with its LF vote vector. */
  final case class LabeledPair(doc: String, col: String, votes: Seq[Int])

  final case class GenerativeResult(
      accuracies: Seq[Double], // balanced accuracy (sensitivity + specificity)/2
      sensitivities: Seq[Double],
      falsePositiveRates: Seq[Double],
      probs: Map[(String, String), Double],
  )

  /** Two-coin Dawid–Skene EM over LF parameters and latent pair labels.
    *
    * The LFs here are *top-k index probes*: a 1-vote is strong positive
    * evidence but a 0-vote is weak (the probe is bounded by k), so each LF is
    * modelled with a sensitivity r = P(vote=1 | related) and a false-positive
    * rate q = P(vote=1 | unrelated) rather than one symmetric accuracy — a
    * symmetric model degenerates by explaining single-vote pairs as negatives
    * with an "anti-correlated" LF. `mask(j) = false` switches LF j off
    * (gold-label tuning, §4.1).
    */
  def generative(
      pairs: Seq[LabeledPair],
      mask: Seq[Boolean] = Seq.empty,
      iters: Int = 30,
      initialPrior: Double = 0.3,
  ): GenerativeResult = {
    if (pairs.isEmpty) return GenerativeResult(Seq.empty, Seq.empty, Seq.empty, Map.empty)
    val nLf = pairs.head.votes.size
    val m = if (mask.nonEmpty) mask else Seq.fill(nLf)(true)
    val active = (0 until nLf).filter(m(_))
    val sens = Array.fill(nLf)(0.6)
    val fpr = Array.fill(nLf)(0.05)
    var prior = initialPrior
    var probs = Array.fill(pairs.size)(0.5)

    for (_ <- 0 until iters) {
      // E-step: posterior P(y=1 | votes) under the two-coin likelihood.
      probs = pairs.map { p =>
        var l1 = math.log(math.max(prior, 1e-9))
        var l0 = math.log(math.max(1 - prior, 1e-9))
        for (j <- active) {
          val v = p.votes(j)
          l1 += math.log(if (v == 1) sens(j) else 1 - sens(j))
          l0 += math.log(if (v == 1) fpr(j) else 1 - fpr(j))
        }
        val mx = math.max(l1, l0)
        val e1 = math.exp(l1 - mx); val e0 = math.exp(l0 - mx)
        e1 / (e1 + e0)
      }.toArray
      // M-step: per-LF sensitivity and false-positive rate.
      val posMass = probs.sum
      val negMass = probs.length - posMass
      for (j <- 0 until nLf) {
        val posVotes = pairs.zip(probs).collect { case (p, q) if p.votes(j) == 1 => q }.sum
        val negVotes = pairs.zip(probs).collect { case (p, q) if p.votes(j) == 1 => 1 - q }.sum
        sens(j) = clamp(posVotes / math.max(posMass, 1e-9), 0.1, 0.95)
        fpr(j) = clamp(negVotes / math.max(negMass, 1e-9), 0.01, 0.5)
      }
      prior = clamp(posMass / probs.length, 0.02, 0.98)
    }
    val balanced = (0 until nLf).map(j => (sens(j) + (1 - fpr(j))) / 2.0)
    GenerativeResult(balanced, sens.toSeq, fpr.toSeq,
      pairs.zip(probs).map { case (p, q) => (p.doc, p.col) -> q }.toMap)
  }

  /** Logistic-regression discriminator trained by SGD on probabilistic
    * labels (standard cross-entropy, §4.1). Features are the pair's raw
    * similarity scores; returns the weight vector (bias last).
    */
  def trainDiscriminator(
      data: Seq[(Array[Double], Double)],
      epochs: Int = 60,
      lr: Double = 0.5,
      seed: Long = 17L,
  ): Array[Double] = {
    require(data.nonEmpty, "no training data")
    val dim = data.head._1.length
    val w = new Array[Double](dim + 1)
    val rnd = new Random(seed)
    val idx = data.indices.toArray
    for (_ <- 0 until epochs) {
      val order = rnd.shuffle(idx.toSeq)
      for (i <- order) {
        val (x, y) = data(i)
        val p = predict(w, x)
        val g = p - y
        var j = 0
        while (j < dim) { w(j) -= lr * g * x(j); j += 1 }
        w(dim) -= lr * g
      }
    }
    w
  }

  /** Sigmoid score of the discriminator for a feature vector. */
  def predict(w: Array[Double], x: Array[Double]): Double = {
    var z = w(w.length - 1)
    var j = 0
    while (j < x.length) { z += w(j) * x(j); j += 1 }
    1.0 / (1.0 + math.exp(-z))
  }

  private def clamp(x: Double, lo: Double, hi: Double): Double = math.max(lo, math.min(hi, x))
}
