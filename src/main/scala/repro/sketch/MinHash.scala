package repro.sketch

import scala.util.hashing.MurmurHash3

/** Minwise hashing sketches (§3 "Syntactic Similarity via Jaccard Distances").
  *
  * Signatures are deterministic in the value set: hash i of a set is the
  * minimum over members of a seeded 64-bit mix of MurmurHash3. The Jaccard
  * estimator is the classic matching-component fraction; the containment
  * estimator converts the Jaccard estimate using the exact cardinalities that
  * the profiler stores alongside each sketch (the Lazo [34] / LSHEnsemble [69]
  * estimation family).
  */
object MinHash {

  val DefaultNumHashes = 256

  /** 64-bit avalanche mix (splitmix64 finaliser) over a murmur seed. */
  private def mix(seed: Int, value: String): Long = {
    var z = (MurmurHash3.stringHash(value, seed).toLong << 32) |
      (MurmurHash3.stringHash(value, seed ^ 0x5bd1e995) & 0xffffffffL)
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** k-minwise signature of a value set. Empty sets get Long.MaxValue rows. */
  def signature(values: Iterable[String], numHashes: Int = DefaultNumHashes): Array[Long] = {
    val sig = Array.fill(numHashes)(Long.MaxValue)
    for (v <- values) {
      var i = 0
      while (i < numHashes) {
        val h = mix(i * 0x9e3779b9 + 1, v)
        if (h < sig(i)) sig(i) = h
        i += 1
      }
    }
    sig
  }

  /** Estimated Jaccard similarity: fraction of matching signature rows. */
  def estJaccard(a: Array[Long], b: Array[Long]): Double = {
    require(a.length == b.length, "signature lengths differ")
    if (a.isEmpty) return 0.0
    var eq = 0; var i = 0
    while (i < a.length) { if (a(i) == b(i) && a(i) != Long.MaxValue) eq += 1; i += 1 }
    eq.toDouble / a.length
  }

  /** Estimated containment of A in B, from the Jaccard estimate and the exact
    * cardinalities: |A∩B| ≈ J/(1+J)·(|A|+|B|), containment ≈ |A∩B|/|A|.
    */
  def estContainment(sigA: Array[Long], cardA: Long, sigB: Array[Long], cardB: Long): Double = {
    if (cardA <= 0) return 0.0
    val j = estJaccard(sigA, sigB)
    val inter = j / (1.0 + j) * (cardA + cardB)
    math.min(1.0, inter / cardA)
  }
}
