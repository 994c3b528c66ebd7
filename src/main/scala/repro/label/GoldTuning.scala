package repro.label

/** Gold-label preprocessing of the weak-supervision pipeline (§4.1).
  *
  * Given a tiny gold-labeled subset — far too small to train on — measure
  * each labeling function's accuracy and switch off every LF whose accuracy
  * falls below `relativeThreshold` (default 50%) of the best LF's. This is
  * the mechanism that rescues the joint model when one LF is badly wrong
  * (the Benchmark-1C phenomenon, Fig. 9b).
  */
object GoldTuning {

  val DefaultRelativeThreshold = 0.5

  /** Per-LF accuracy over gold pairs: fraction of votes agreeing with gold. */
  def accuracies(goldVotes: Seq[(Seq[Int], Int)]): Seq[Double] = {
    if (goldVotes.isEmpty) return Seq.empty
    val nLf = goldVotes.head._1.size
    (0 until nLf).map { j =>
      goldVotes.count { case (votes, gold) => votes(j) == gold }.toDouble / goldVotes.size
    }
  }

  /** Keep-mask over LFs: true iff accuracy ≥ threshold × best accuracy.
    * Always keeps at least the best LF.
    */
  def keepMask(goldVotes: Seq[(Seq[Int], Int)],
      relativeThreshold: Double = DefaultRelativeThreshold): Seq[Boolean] = {
    val accs = accuracies(goldVotes)
    if (accs.isEmpty) return Seq.empty
    val best = accs.max
    accs.map(a => a >= relativeThreshold * best)
  }
}
