package repro.baseline

import repro.lake.ColRef
import repro.profile.{ColumnProfile, Tags}
import repro.sketch.{MinHash, Similarity}

import repro.discover.JoinDiscovery

/** The Aurum [31] baseline, re-implemented from its published scoring rules.
  *
  * Aurum materializes schema- and content-similarity links between column
  * pairs into a knowledge graph. The content measure is plain *Jaccard
  * similarity* estimated from minhash signatures — the paper's Tables 3 and 4
  * trace Aurum's weaknesses (and its DrugBank precision edge) to exactly this
  * choice. PK-FK additionally requires the PK side to be strictly key-like
  * (uniqueness ≥ 0.95, no tolerance for duplicate-bearing keys) and applies
  * no schema-name filter; numeric pairs share CMDL's numeric rule (§6.2).
  * Unionability combines schema similarity and Jaccard similarity by taking
  * the maximum of the two (§6.3).
  */
object Aurum {

  final case class PkfkConfig(
      jaccardThreshold: Double = 0.22,
      pkUniqueness: Double = 0.95,
      numericOverlapThreshold: Double = 0.5,
      numericPkUniqueness: Double = 0.95,
  )

  /** Syntactic-join ranking by estimated Jaccard similarity. */
  final class SyntacticIndex(profiles: Seq[ColumnProfile]) {
    private val joinable = profiles.filter(_.hasTag(Tags.Joinable)).toIndexedSeq

    def topK(query: ColumnProfile, k: Int): Seq[(ColRef, Double)] =
      joinable.iterator
        .filter(_.table != query.table)
        .map(c => (ColRef(c.table, c.column), MinHash.estJaccard(query.sig, c.sig)))
        .filter(_._2 > 0)
        .toSeq
        .sortBy { case (ref, s) => (-s, ref.render) }
        .take(k)
  }

  /** PK-FK discovery: Jaccard similarity as the inclusion measure. */
  def pkfk(profiles: Seq[ColumnProfile], cfg: PkfkConfig = PkfkConfig()): Set[(ColRef, ColRef)] = {
    val cands = profiles.filter(p =>
      p.hasTag(Tags.Joinable) && (p.dtype == "id" || p.dtype == "numeric") && p.card > 0)
    val links = for {
      p <- cands
      f <- cands
      if p.table != f.table
      if isLink(p, f, cfg)
    } yield (ColRef(p.table, p.column), ColRef(f.table, f.column))
    links.toSet
  }

  private def isLink(p: ColumnProfile, f: ColumnProfile, cfg: PkfkConfig): Boolean =
    if (p.isNumeric || f.isNumeric) {
      // Same numeric path as CMDL — the reason Table 4's ChEBI rows coincide.
      p.isNumeric && f.isNumeric &&
      JoinDiscovery.numericPkfkRule(p, f, cfg.numericOverlapThreshold, cfg.numericPkUniqueness)
    } else {
      p.uniqueness >= cfg.pkUniqueness &&
      MinHash.estJaccard(p.sig, f.sig) >= cfg.jaccardThreshold
    }

  /** Column-level unionability score: max(schema similarity, Jaccard). */
  def unionColumnScore(a: ColumnProfile, b: ColumnProfile): Double =
    math.max(Similarity.nameSimilarity(a.column, b.column), MinHash.estJaccard(a.sig, b.sig))
}
