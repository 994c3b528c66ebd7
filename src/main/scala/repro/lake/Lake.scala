package repro.lake

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.profile.{RawColumn, RawDoc}

/** A column reference `table.column` — the DE identity used by every
  * benchmark ground truth and discovery result.
  */
final case class ColRef(table: String, column: String) {
  def render: String = s"$table.$column"
}

object ColRef {
  def parse(s: String): ColRef = {
    val i = s.lastIndexOf('.')
    ColRef(s.substring(0, i), s.substring(i + 1))
  }
}

/** One structured table of a lake, belonging to a named collection
  * (DrugBank, ChEMBL, Govt. data, SS/MS/LS, ...).
  */
final case class LakeTable(collection: String, name: String, columns: Vector[RawColumn])

/** Doc→Table benchmark (1A/1B/1C): a query is a document, the answer the set
  * of related tables; `docColumns` keeps the column-level links the table
  * answers aggregate from (and from which mQCR is computed).
  */
final case class DocBench(
    id: String,
    queries: Map[String, Set[String]],
    docColumns: Map[String, Set[ColRef]],
)

/** Syntactic-join benchmark (2A/2B/2C): per query column, the ground-truth
  * joinable columns in other tables.
  */
final case class JoinBench(id: String, workload: String, queries: Map[ColRef, Set[ColRef]])

/** PK-FK benchmark (2D): one query per database, the answer the full set of
  * (pk, fk) links.
  */
final case class PkfkBench(id: String, database: String, gt: Set[(ColRef, ColRef)])

/** Unionability benchmark (3A/3B): per query table, the ground-truth
  * unionable tables.
  */
final case class UnionBench(id: String, workload: String, queries: Map[String, Set[String]])

/** A data lake: structured tables + unstructured documents + the benchmark
  * ground truths that the generator derives while building the data (Table 2's
  * "Ground Truth Generation" column).
  */
final case class Lake(
    name: String,
    tables: Vector[LakeTable],
    docs: Vector[RawDoc],
    docBenches: Seq[DocBench] = Seq.empty,
    joinBenches: Seq[JoinBench] = Seq.empty,
    pkfkBenches: Seq[PkfkBench] = Seq.empty,
    unionBenches: Seq[UnionBench] = Seq.empty,
) {
  def rawColumns: Seq[RawColumn] = tables.flatMap(_.columns)

  def columnsIn(collections: String*): Seq[RawColumn] = {
    val set = collections.toSet
    tables.filter(t => set.contains(t.collection)).flatMap(_.columns)
  }

  def tablesIn(collections: String*): Seq[LakeTable] = {
    val set = collections.toSet
    tables.filter(t => set.contains(t.collection))
  }

  def docsIn(collection: String): Seq[RawDoc] = docs.filter(_.collection == collection)

  /** Exact (lowercased, distinct) value set of a column — ground-truth-grade,
    * used by generators and tests, never by the online discovery path.
    */
  def valueSet(ref: ColRef): Set[String] =
    rawColumns
      .find(c => c.table == ref.table && c.column == ref.column)
      .map(_.values.map(_.trim.toLowerCase).filter(_.nonEmpty).toSet)
      .getOrElse(Set.empty)

  /** The structured modality as a DataFrame of column rows. */
  def columnsDf(spark: SparkSession): DataFrame = {
    import spark.implicits._
    spark.createDataset(rawColumns).toDF()
  }

  /** The unstructured modality as a DataFrame of documents. */
  def docsDf(spark: SparkSession): DataFrame = {
    import spark.implicits._
    spark.createDataset(docs).toDF()
  }
}
