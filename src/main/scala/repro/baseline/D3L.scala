package repro.baseline

import repro.lake.ColRef
import repro.profile.{ColumnProfile, Tags}
import repro.sketch.{MinHash, Similarity}

/** The D3L [15] baseline, re-implemented from its published design.
  *
  * D3L builds hash-based signatures over multiple fine-grained signals —
  * column *name* (q-grams), *value* overlap (minhash Jaccard), *format*
  * (character-shape features) and *numeric distribution* — and combines the
  * per-signal distances at query time with a weighted Euclidean sum. Its
  * value signal is still Jaccard *similarity*, so it inherits Aurum's
  * weakness under cardinality skew (Table 3); its extra name signal is what
  * lifts it above Aurum on DrugBank (2B), where joinable columns share names.
  */
object D3L {

  /** Per-signal similarities in [0,1] for a column pair. */
  final case class Signals(name: Double, value: Double, format: Double, numeric: Double)

  def signals(a: ColumnProfile, b: ColumnProfile): Signals = Signals(
    name = Similarity.nameSimilarity(a.column, b.column),
    value = MinHash.estJaccard(a.sig, b.sig),
    format = formatSimilarity(a, b),
    numeric =
      if (a.isNumeric && b.isNumeric && !a.numMin.isNaN && !b.numMin.isNaN)
        Similarity.numericOverlap(a.numMin, a.numMax, b.numMin, b.numMax)
      else 0.0,
  )

  /** Format similarity from the profiler's shape features (len, digit%, alpha%). */
  def formatSimilarity(a: ColumnProfile, b: ColumnProfile): Double = {
    val fa = a.formatFeats; val fb = b.formatFeats
    if (fa.isEmpty || fb.isEmpty) return 0.0
    val lenSim = 1.0 - math.min(1.0, math.abs(fa(0) - fb(0)) / math.max(math.max(fa(0), fb(0)), 1.0))
    val digSim = 1.0 - math.abs(fa(1) - fb(1))
    val alpSim = 1.0 - math.abs(fa(2) - fb(2))
    (lenSim + digSim + alpSim) / 3.0
  }

  /** Weighted-Euclidean combination of the signal distances, returned as a
    * similarity (1 - distance). Join ranking uses value+name+format; union
    * ranking adds the numeric signal.
    */
  def combine(s: Signals, weights: Signals = Signals(0.3, 0.5, 0.2, 0.0)): Double = {
    val terms = Seq(
      (weights.name, 1.0 - s.name),
      (weights.value, 1.0 - s.value),
      (weights.format, 1.0 - s.format),
      (weights.numeric, 1.0 - s.numeric),
    ).filter(_._1 > 0)
    val wsum = terms.map(_._1).sum
    val dist = math.sqrt(terms.map { case (w, d) => (w / wsum) * d * d }.sum)
    1.0 - dist
  }

  /** Syntactic-join ranking by the combined signal similarity. */
  final class SyntacticIndex(profiles: Seq[ColumnProfile]) {
    private val joinable = profiles.filter(_.hasTag(Tags.Joinable)).toIndexedSeq

    def topK(query: ColumnProfile, k: Int): Seq[(ColRef, Double)] =
      joinable.iterator
        .filter(_.table != query.table)
        .map { c =>
          val s = signals(query, c)
          (ColRef(c.table, c.column), if (s.value > 0 || s.numeric > 0) combine(s) else 0.0)
        }
        .filter(_._2 > 0)
        .toSeq
        .sortBy { case (ref, s) => (-s, ref.render) }
        .take(k)
  }

  /** Column-level unionability similarity (all four signals, equal weight). */
  def unionColumnScore(a: ColumnProfile, b: ColumnProfile): Double =
    combine(signals(a, b), Signals(0.25, 0.25, 0.25, 0.25))
}
