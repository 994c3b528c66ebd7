package repro.discover

import repro.lake.ColRef
import repro.profile.{ColumnProfile, Tags}
import repro.sketch.{LshEnsemble, MinHash, Similarity}

/** CMDL joinability discovery (§5.1, Tables 3 and 4).
  *
  * Syntactic join: candidates come from an LSH-Ensemble probe and are ranked
  * by the *maximum-direction* estimated Jaccard set containment — the measure
  * CMDL adopts over plain Jaccard similarity because it survives skewed
  * cardinalities between the joined DEs.
  *
  * PK-FK: a pair (P, F) is emitted when F's values are (estimated) contained
  * in P, P is key-like, and the two columns have similar names (CMDL's schema
  * similarity filter). CMDL's key-ness test is deliberately tolerant of
  * slightly duplicate-bearing keys (`pkUniqueness` = 0.85), which is what
  * gives it high recall but lower precision on DrugBank (Table 4). Numeric
  * column pairs share Aurum's numeric-overlap rule verbatim, which is why the
  * two systems coincide on ChEBI.
  */
object JoinDiscovery {

  final case class PkfkConfig(
      contThreshold: Double = 0.75,
      nameSimThreshold: Double = 0.3,
      pkUniqueness: Double = 0.85,
      numericOverlapThreshold: Double = 0.5,
      numericPkUniqueness: Double = 0.95,
  )

  /** Top-k syntactic-join index over column profiles. */
  final class SyntacticIndex(profiles: Seq[ColumnProfile]) {
    private val joinable = profiles.filter(_.hasTag(Tags.Joinable)).toIndexedSeq
    private val byRef: Map[String, ColumnProfile] = joinable.map(p => p.ref -> p).toMap
    private val lsh = new LshEnsemble(joinable.map(p => LshEnsemble.Entry(p.ref, p.sig, p.card)))

    /** Rank candidate columns (other tables) by max-direction containment. */
    def topK(query: ColumnProfile, k: Int): Seq[(ColRef, Double)] =
      lsh.query(query.sig, query.card, k + 32) // over-fetch: same-table hits are dropped
        .flatMap { case (ref, contQtoC) =>
          val cand = byRef(ref)
          if (cand.table == query.table) None
          else {
            val contCtoQ = MinHash.estContainment(cand.sig, cand.card, query.sig, query.card)
            Some((ColRef(cand.table, cand.column), math.max(contQtoC, contCtoQ)))
          }
        }
        .sortBy { case (ref, s) => (-s, ref.render) }
        .take(k)
  }

  /** PK-FK discovery over one database's profiles — emits (pk, fk) links. */
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
      p.isNumeric && f.isNumeric && numericPkfkRule(p, f, cfg.numericOverlapThreshold, cfg.numericPkUniqueness)
    } else {
      p.uniqueness >= cfg.pkUniqueness &&
      MinHash.estContainment(f.sig, f.card, p.sig, p.card) >= cfg.contThreshold &&
      Similarity.nameSimilarity(p.column, f.column) >= cfg.nameSimThreshold
    }

  /** The numeric-key rule shared verbatim between CMDL and Aurum (§6.2):
    * range overlap of the FK inside the PK's range plus a strict key-ness
    * test on the PK side. Exposed so both systems call the same code.
    */
  def numericPkfkRule(p: ColumnProfile, f: ColumnProfile,
      overlapThreshold: Double, pkUniqueness: Double): Boolean = {
    if (p.numMin.isNaN || f.numMin.isNaN) return false
    p.uniqueness >= pkUniqueness &&
    Similarity.numericOverlap(f.numMin, f.numMax, p.numMin, p.numMax) >= overlapThreshold
  }
}
