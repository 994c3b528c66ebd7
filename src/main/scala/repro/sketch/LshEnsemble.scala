package repro.sketch

import scala.collection.mutable
import scala.util.hashing.MurmurHash3

/** LSH-Ensemble-style containment index [69] (§3).
  *
  * Indexed sets are partitioned by cardinality (equi-depth on log-cardinality,
  * as the original partitions by domain size) and each partition holds a
  * banded minhash LSH table. A probe hashes the query signature's bands in
  * each partition, collects candidates colliding on at least one band, ranks
  * them by the MinHash containment estimate (query → candidate), and returns
  * the top-k. Threshold probes (`queryThreshold`) keep every candidate whose
  * estimate clears the threshold — the paper notes this threshold-based
  * behaviour is why LSHEnsemble alone ranks poorly (§6.1).
  */
final class LshEnsemble(
    entries: Seq[LshEnsemble.Entry],
    numPartitions: Int = 4,
    // One row per band by default: a containment probe from a small query into
    // a large domain has a tiny Jaccard, so multi-row bands would never
    // collide — the original index tunes (b, r) per partition down to r≈1 for
    // exactly this case; we bake that operating point in.
    bands: Int = MinHash.DefaultNumHashes,
) {
  import LshEnsemble._

  private val numHashes = entries.headOption.map(_.sig.length).getOrElse(MinHash.DefaultNumHashes)
  private val rowsPerBand = math.max(1, numHashes / bands)

  // Equi-depth partitions over cardinality-sorted entries.
  private val partitions: IndexedSeq[Partition] = {
    val sorted = entries.sortBy(_.card).toIndexedSeq
    if (sorted.isEmpty) IndexedSeq.empty
    else {
      val per = math.max(1, math.ceil(sorted.size.toDouble / numPartitions).toInt)
      sorted.grouped(per).map { group =>
        val table = mutable.HashMap.empty[(Int, Int), mutable.ArrayBuffer[Int]]
        for ((e, localIdx) <- group.zipWithIndex; b <- 0 until bands) {
          table.getOrElseUpdate((b, bandHash(e.sig, b)), mutable.ArrayBuffer.empty) += localIdx
        }
        Partition(group, table.view.mapValues(_.toArray).toMap)
      }.toIndexedSeq
    }
  }

  private def bandHash(sig: Array[Long], band: Int): Int = {
    val from = band * rowsPerBand
    val until = math.min(sig.length, from + rowsPerBand)
    var h = MurmurHash3.symmetricSeed + band
    var i = from
    while (i < until) { h = MurmurHash3.mix(h, (sig(i) ^ (sig(i) >>> 32)).toInt); i += 1 }
    MurmurHash3.finalizeHash(h, until - from)
  }

  private def candidates(sig: Array[Long]): Iterator[Entry] =
    partitions.iterator.flatMap { p =>
      val seen = mutable.BitSet.empty
      (0 until bands).iterator
        .flatMap(b => p.table.getOrElse((b, bandHash(sig, b)), Array.empty[Int]))
        .filter(seen.add)
        .map(p.entries)
    }

  /** Top-k entries by estimated containment of the query set in the entry. */
  def query(sig: Array[Long], card: Long, k: Int): Seq[(String, Double)] =
    candidates(sig)
      .map(e => (e.id, MinHash.estContainment(sig, card, e.sig, e.card)))
      .toSeq
      .sortBy { case (id, s) => (-s, id) }
      .take(k)

  /** All entries whose estimated containment clears `threshold` (unranked
    * semantics of the original index; returned sorted only for determinism).
    */
  def queryThreshold(sig: Array[Long], card: Long, threshold: Double): Seq[(String, Double)] =
    candidates(sig)
      .map(e => (e.id, MinHash.estContainment(sig, card, e.sig, e.card)))
      .filter(_._2 >= threshold)
      .toSeq
      .sortBy { case (id, s) => (-s, id) }

  def size: Int = entries.size
}

object LshEnsemble {
  /** An indexed set: stable id, minhash signature, exact cardinality. */
  final case class Entry(id: String, sig: Array[Long], card: Long)
  private final case class Partition(entries: IndexedSeq[Entry], table: Map[(Int, Int), Array[Int]])

  def build(sets: Seq[(String, Set[String])], numHashes: Int = MinHash.DefaultNumHashes): LshEnsemble =
    new LshEnsemble(sets.map { case (id, s) => Entry(id, MinHash.signature(s, numHashes), s.size) })
}
