package repro.baseline

import repro.lake.LakeTable
import repro.sketch.Similarity
import repro.text.Tokenizer

/** The entity-matching baseline of §6.1 (SpaCy/SciSpaCy + Jaccard or Jaro).
  *
  * Each table tuple is treated as a document; a doc relates to a table if an
  * entity-matching connection exists between the doc and any tuple. Entity
  * extraction is the SpaCy substitute: capitalised tokens and long
  * alphanumeric tokens are taken as entity mentions — deliberately a *generic*
  * extractor, reproducing the paper's observation that un-tuned extraction
  * yields near-random relationships outside the biomedical benchmark.
  */
object EntityMatch {

  /** Heuristic entity extraction: capitalised words and digit-bearing tokens. */
  def extractEntities(text: String): Set[String] = {
    val raw = text.split("[^A-Za-z0-9]+").toSeq.filter(_.nonEmpty)
    raw.filter(t => (t.headOption.exists(_.isUpper) || t.exists(_.isDigit)) && t.length > 2)
      .map(_.toLowerCase)
      .filterNot(Tokenizer.Stopwords.contains)
      .toSet
  }

  /** Tuples of a table, built by aligning columns positionally. */
  def tuples(table: LakeTable, maxTuples: Int = 200): Seq[Set[String]] = {
    if (table.columns.isEmpty) return Seq.empty
    val nRows = math.min(table.columns.map(_.values.size).max, maxTuples)
    (0 until nRows).map { i =>
      table.columns.flatMap(c => c.values.lift(i)).map(_.toLowerCase).toSet
    }
  }

  /** Doc-table relatedness under Jaccard entity matching. */
  def scoreJaccard(docText: String, table: LakeTable): Double = {
    val ents = extractEntities(docText)
    if (ents.isEmpty) return 0.0
    val ts = tuples(table)
    if (ts.isEmpty) 0.0 else ts.map(t => Similarity.jaccard(ents, t)).max
  }

  /** Doc-table relatedness under Jaro entity matching: best average Jaro of
    * each doc entity against its closest tuple value (quadratic — the paper
    * notes this becomes infeasible at PubMed scale).
    */
  def scoreJaro(docText: String, table: LakeTable): Double = {
    val ents = extractEntities(docText).toSeq
    if (ents.isEmpty) return 0.0
    val ts = tuples(table, maxTuples = 60)
    if (ts.isEmpty) return 0.0
    ts.map { t =>
      if (t.isEmpty) 0.0
      else ents.map(e => t.map(v => Similarity.jaro(e, v)).max).sum / ents.size
    }.max
  }
}
