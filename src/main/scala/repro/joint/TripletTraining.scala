package repro.joint

import scala.collection.mutable
import scala.util.Random

/** The joint-representation training workflow of Fig. 4 and Fig. 5.
  *
  * Mini-Batch Generator: each epoch partitions the document and column DEs
  * into non-overlapping mini-batches whose m:n ratio matches the global
  * document:column ratio; the union of batches covers the training set.
  *
  * Triplet Generator with hard sampling: within a batch, a document anchor's
  * positives (relatedness ≥ threshold) are aggregated into a single mean
  * instance, and only the *hard* negatives — those whose current joint-space
  * distance to the anchor is within the cutoff (average or median negative
  * distance) — are aggregated into the negative instance, yielding exactly
  * one triplet per anchor. `HardStrategy.None` generates all quadratic
  * positive×negative combinations instead (the ablation of Fig. 10b).
  */
object TripletTraining {

  sealed trait HardStrategy
  object HardStrategy {
    case object Avg extends HardStrategy
    case object Median extends HardStrategy
    case object None extends HardStrategy
  }

  /** A discoverable element ready for training: id + 200-d input encoding. */
  final case class De(id: String, enc: Array[Double])

  final case class Config(
      batchFrac: Double = 0.08,
      margin: Double = 0.2,
      lr: Double = 0.02,
      maxEpochs: Int = 300,
      convergenceTol: Double = 1e-4,
      posThreshold: Double = 0.5,
      hardStrategy: HardStrategy = HardStrategy.Avg,
      seed: Long = 23L,
  )

  final case class Result(model: Mlp, epochs: Int, lossHistory: Vector[Double], totalTriplets: Long)

  /** Concatenate metadata and content solo embeddings into the 200-d input. */
  def encode(metaEmb: Array[Float], contentEmb: Array[Float]): Array[Double] = {
    val out = new Array[Double](metaEmb.length + contentEmb.length)
    var i = 0
    while (i < metaEmb.length) { out(i) = metaEmb(i); i += 1 }
    var j = 0
    while (j < contentEmb.length) { out(i + j) = contentEmb(j); j += 1 }
    out
  }

  /** Triplets for one anchor within a mini-batch (Fig. 5). */
  def tripletsFor(
      model: Mlp,
      anchor: De,
      batchCols: Seq[De],
      rel: (String, String) => Double,
      cfg: Config,
  ): Seq[(Array[Double], Array[Double], Array[Double])] = {
    val (pos, neg) = batchCols.partition(c => rel(anchor.id, c.id) >= cfg.posThreshold)
    if (pos.isEmpty || neg.isEmpty) return Seq.empty // anchors without both are ignored
    cfg.hardStrategy match {
      case HardStrategy.None =>
        for (p <- pos; nn <- neg) yield (anchor.enc, p.enc, nn.enc)
      case strat =>
        val aEmb = model.embed(anchor.enc)
        val negDists = neg.map(nn => (nn, model.dist2(aEmb, model.embed(nn.enc))))
        val cutoff = strat match {
          case HardStrategy.Median =>
            val ds = negDists.map(_._2).sorted
            ds(ds.size / 2)
          case _ => negDists.map(_._2).sum / negDists.size
        }
        val hard = negDists.filter(_._2 <= cutoff).map(_._1)
        if (hard.isEmpty) Seq.empty
        else Seq((anchor.enc, mean(pos.map(_.enc)), mean(hard.map(_.enc))))
    }
  }

  /** Full training loop: epochs of covering mini-batch partitions until the
    * epoch loss change falls below the tolerance.
    */
  def train(docs: Seq[De], cols: Seq[De], rel: (String, String) => Double,
      cfg: Config = Config()): Result = {
    val model = new Mlp(seed = cfg.seed)
    require(docs.nonEmpty && cols.nonEmpty, "need DEs of both modalities")
    val nBatches = math.max(1, math.ceil(1.0 / cfg.batchFrac).toInt)
    val rnd = new Random(cfg.seed)
    val losses = mutable.ArrayBuffer.empty[Double]
    var triplets = 0L
    var epoch = 0
    var converged = false
    while (epoch < cfg.maxEpochs && !converged) {
      val docBatches = partition(rnd.shuffle(docs.toVector), nBatches)
      val colBatches = partition(rnd.shuffle(cols.toVector), nBatches)
      var epochLoss = 0.0
      var count = 0
      for ((db, cb) <- docBatches.zip(colBatches); d <- db) {
        for ((a, p, nn) <- tripletsFor(model, d, cb, rel, cfg)) {
          epochLoss += model.tripletStep(a, p, nn, cfg.margin, cfg.lr)
          count += 1
          triplets += 1
        }
      }
      val avgLoss = if (count == 0) 0.0 else epochLoss / count
      losses += avgLoss
      if (losses.size > 5 && math.abs(losses(losses.size - 2) - avgLoss) < cfg.convergenceTol)
        converged = true
      epoch += 1
    }
    Result(model, epoch, losses.toVector, triplets)
  }

  /** Apply a trained model to DEs, producing their joint embeddings. */
  def applyModel(model: Mlp, des: Seq[De]): Map[String, Array[Float]] =
    des.map(d => d.id -> model.embed(d.enc).map(_.toFloat)).toMap

  private def partition(v: Vector[De], nBatches: Int): Vector[Vector[De]] = {
    val per = math.max(1, math.ceil(v.size.toDouble / nBatches).toInt)
    v.grouped(per).toVector
  }

  private def mean(xs: Seq[Array[Double]]): Array[Double] = {
    val out = new Array[Double](xs.head.length)
    for (x <- xs) {
      var i = 0
      while (i < out.length) { out(i) += x(i); i += 1 }
    }
    var i = 0
    while (i < out.length) { out(i) /= xs.size; i += 1 }
    out
  }
}
