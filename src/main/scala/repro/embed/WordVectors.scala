package repro.embed

import scala.util.hashing.MurmurHash3

/** Deterministic subword word embeddings — the fasttext [16] substitute.
  *
  * fasttext represents a word as the sum of vectors of its character n-grams;
  * we reproduce exactly that mechanism with hash-derived pseudo-random n-gram
  * vectors (no trained weights), so words sharing roots ("pemetrexed_12",
  * "pemetrexed_47") land nearby in the space while unrelated words are
  * near-orthogonal. That is the property CMDL's semantic measures and the
  * synthetic lake generator rely on. DE-level vectors are the mean pooling of
  * word vectors (§3, "Semantic Similarity via Solo Embeddings").
  */
object WordVectors {

  val Dim = 100

  private def ngramVector(ngram: String, dim: Int): Array[Float] = {
    val out = new Array[Float](dim)
    var z = (MurmurHash3.stringHash(ngram, 0x2545f491).toLong << 32) |
      (MurmurHash3.stringHash(ngram, 0x1b873593) & 0xffffffffL)
    var i = 0
    while (i < dim) {
      // splitmix64 stream seeded by the n-gram hash
      z += 0x9e3779b97f4a7c15L
      var x = z
      x = (x ^ (x >>> 30)) * 0xbf58476d1ce4e5b9L
      x = (x ^ (x >>> 27)) * 0x94d049bb133111ebL
      x = x ^ (x >>> 31)
      out(i) = ((x >>> 11).toDouble / (1L << 53).toDouble).toFloat * 2f - 1f
      i += 1
    }
    out
  }

  private def ngrams(word: String, lo: Int = 3, hi: Int = 5): Seq[String] = {
    val padded = "<" + word + ">"
    val grams = for {
      n <- lo to hi
      if padded.length >= n
      g <- padded.sliding(n)
    } yield g
    grams :+ padded // whole-word gram, as fasttext does
  }

  /** Unit-norm vector for one word. */
  def wordVector(word: String, dim: Int = Dim): Array[Float] = {
    val acc = new Array[Float](dim)
    for (g <- ngrams(word.toLowerCase)) {
      val v = ngramVector(g, dim)
      var i = 0
      while (i < dim) { acc(i) += v(i); i += 1 }
    }
    normalize(acc)
  }

  /** Mean pooling over word vectors (unbiased set summary [43]), unit-norm. */
  def meanPool(words: Iterable[String], dim: Int = Dim): Array[Float] = {
    val acc = new Array[Float](dim)
    var n = 0
    for (w <- words) {
      val v = wordVector(w, dim)
      var i = 0
      while (i < dim) { acc(i) += v(i); i += 1 }
      n += 1
    }
    if (n == 0) acc
    else {
      var i = 0
      while (i < dim) { acc(i) /= n; i += 1 }
      normalize(acc)
    }
  }

  def cosine(a: Array[Float], b: Array[Float]): Double = {
    require(a.length == b.length, "dim mismatch")
    var dot = 0.0; var na = 0.0; var nb = 0.0; var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0.0 || nb == 0.0) 0.0 else dot / math.sqrt(na * nb)
  }

  def normalize(v: Array[Float]): Array[Float] = {
    var n = 0.0; var i = 0
    while (i < v.length) { n += v(i) * v(i); i += 1 }
    val norm = math.sqrt(n)
    if (norm > 0) { i = 0; while (i < v.length) { v(i) = (v(i) / norm).toFloat; i += 1 } }
    v
  }
}
