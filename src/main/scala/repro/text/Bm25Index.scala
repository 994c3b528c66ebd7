package repro.text

import scala.collection.mutable

/** In-memory inverted index with BM25 and LM-Dirichlet ranking.
  *
  * Substitute for the locally-hosted Elasticsearch engine the paper probes
  * (§3 "Indexing Profiler-Generated Sketches", Table 6). CMDL builds two such
  * indexes per modality — one over content bags and one over metadata
  * (names/titles) — and uses top-k probes both as discovery primitives and as
  * weak-supervision labeling functions (Fig. 3).
  *
  * @param docs id -> bag of (already preprocessed) terms
  */
final class Bm25Index(docs: Map[String, Seq[String]], k1: Double = 1.2, b: Double = 0.75) {

  private val ids: IndexedSeq[String] = docs.keys.toIndexedSeq.sorted
  private val idOf: Map[String, Int]  = ids.zipWithIndex.toMap
  private val lens: Array[Int]        = ids.map(docs(_).size).toArray
  private val avgdl: Double           = if (ids.isEmpty) 0.0 else lens.sum.toDouble / ids.size
  private val corpusLen: Long         = lens.map(_.toLong).sum

  // term -> (docIdx, tf) postings; and term -> corpus frequency for LM smoothing
  private val postings: Map[String, Array[(Int, Int)]] = {
    val m = mutable.HashMap.empty[String, mutable.ArrayBuffer[(Int, Int)]]
    for ((id, i) <- ids.zipWithIndex) {
      val tfs = docs(id).groupBy(identity).view.mapValues(_.size)
      for ((t, tf) <- tfs) m.getOrElseUpdate(t, mutable.ArrayBuffer.empty) += ((i, tf))
    }
    m.view.mapValues(_.toArray).toMap
  }
  private val cf: Map[String, Long] =
    postings.view.mapValues(_.map(_._2.toLong).sum).toMap

  def size: Int = ids.size
  def vocabulary: Set[String] = postings.keySet

  private def idf(term: String): Double = {
    val n = postings.get(term).map(_.length).getOrElse(0)
    math.log(1.0 + (ids.size - n + 0.5) / (n + 0.5))
  }

  /** Top-k documents by BM25 (TF/IDF probabilistic relevance [58]). */
  def query(terms: Seq[String], k: Int): Seq[(String, Double)] = {
    val scores = new Array[Double](ids.size)
    for (t <- terms.distinct; ps <- postings.get(t)) {
      val w = idf(t)
      for ((i, tf) <- ps) {
        val norm = tf * (k1 + 1) / (tf + k1 * (1 - b + b * lens(i) / math.max(avgdl, 1e-9)))
        scores(i) += w * norm
      }
    }
    topK(scores, k)
  }

  /** Top-k documents by query-likelihood with Dirichlet smoothing (the "LM
    * Dirichlet" elastic-search setting of §6.1), mu defaulting to 2000.
    */
  def queryLmDirichlet(terms: Seq[String], k: Int, mu: Double = 2000.0): Seq[(String, Double)] = {
    val scores = new Array[Double](ids.size)
    var touched = false
    for (t <- terms; ps <- postings.get(t)) {
      touched = true
      val pC = cf(t).toDouble / math.max(corpusLen, 1L)
      val tfByDoc = ps.toMap
      for (i <- ids.indices) {
        val tf = tfByDoc.getOrElse(i, 0)
        scores(i) += math.log((tf + mu * pC) / (lens(i) + mu))
      }
    }
    if (!touched) Seq.empty else topK(scores, k)
  }

  private def topK(scores: Array[Double], k: Int): Seq[(String, Double)] =
    scores.zipWithIndex
      .filter(_._1 != 0.0)
      .sortBy { case (s, i) => (-s, ids(i)) }
      .take(k)
      .map { case (s, i) => (ids(i), s) }
      .toSeq

  /** Score of a single document for a query (0 if no term matches). */
  def score(terms: Seq[String], id: String): Double =
    idOf.get(id).map { i =>
      terms.distinct.flatMap { t =>
        postings.get(t).flatMap(_.find(_._1 == i)).map { case (_, tf) =>
          idf(t) * tf * (k1 + 1) / (tf + k1 * (1 - b + b * lens(i) / math.max(avgdl, 1e-9)))
        }
      }.sum
    }.getOrElse(0.0)
}
