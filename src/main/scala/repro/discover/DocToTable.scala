package repro.discover

import repro.embed.WordVectors
import repro.lake.ColRef
import repro.profile.{ColumnProfile, DocProfile, Tags}
import repro.sketch.MinHash
import repro.text.Bm25Index

/** Cross-modal Doc→Table discovery (§6.1).
  *
  * Every method scores document-column relatedness first, then aggregates
  * column scores to the table level (max-pooling — a table is as related as
  * its most related column, per the Doc-to-Table relationship definition of
  * §2.1). The CMDL variants differ only in the embedding space used (solo vs
  * joint); the baselines are the sketch/index probes of §6.1.
  */
object DocToTable {

  /** Aggregate per-column scores to ranked tables. */
  def aggregateToTables(colScores: Seq[(ColRef, Double)], k: Int): Seq[(String, Double)] =
    colScores
      .groupBy(_._1.table)
      .view.mapValues(_.map(_._2).max)
      .toSeq
      .sortBy { case (t, s) => (-s, t) }
      .take(k)

  /** Embedding-based ranking (CMDL solo or joint): cosine of the document's
    * embedding against every text-searchable column's embedding.
    */
  def embeddingRank(
      docEmb: Array[Float],
      cols: Seq[ColumnProfile],
      colEmb: ColumnProfile => Array[Float],
      k: Int,
  ): Seq[(String, Double)] = {
    val colScores = cols
      .filter(_.hasTag(Tags.TextSearch))
      .map(c => (ColRef(c.table, c.column), math.max(0.0, WordVectors.cosine(docEmb, colEmb(c)))))
    aggregateToTables(colScores, k)
  }

  /** Containment-based baseline: estimated containment of the doc's bag in
    * each column's value set (the LSHEnsemble labeling-function measure).
    */
  def containmentRank(doc: DocProfile, cols: Seq[ColumnProfile], k: Int): Seq[(String, Double)] = {
    val colScores = cols
      .filter(_.hasTag(Tags.TextSearch))
      .map(c => (ColRef(c.table, c.column), MinHash.estContainment(doc.sig, doc.card, c.sig, c.card)))
    aggregateToTables(colScores, k)
  }

  /** Elastic-search baseline over column content or metadata bags: BM25 or
    * LM-Dirichlet, with the document's bag as the query.
    */
  def keywordRank(doc: DocProfile, index: Bm25Index, colOf: String => ColRef,
      k: Int, lmDirichlet: Boolean = false): Seq[(String, Double)] = {
    val hits =
      if (lmDirichlet) index.queryLmDirichlet(doc.bag, k * 8)
      else index.query(doc.bag, k * 8)
    aggregateToTables(hits.map { case (id, s) => (colOf(id), s) }, k)
  }
}
