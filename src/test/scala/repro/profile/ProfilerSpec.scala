package repro.profile

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.sketch.MinHash

class ProfilerSpec extends SparkSpec {

  private val textCol = RawColumn("c", "drugs", "drug_name", "text",
    (1 to 50).map(i => s"drugmed$i") ++ Seq("drugmed1", "drugmed2")) // 2 dup rows
  private val numCol = RawColumn("c", "prices", "unit_price", "numeric",
    Seq("5", "10", "3", "20", "10"))
  private val catCol = RawColumn("c", "drugs", "drug_type", "categorical",
    Seq.fill(100)("biotech") ++ Seq.fill(100)("vaccine"))
  private val dateCol = RawColumn("c", "trials", "start_date", "date",
    (1 to 30).map(i => s"2020-01-$i"))
  private val longText = RawColumn("c", "drugs", "description", "text",
    (1 to 20).map(i => s"a very long clinical monograph paragraph number $i that easily exceeds the joinable length limit"))

  test("profileColumn counts rows, cardinality and uniqueness") {
    val p = Profiler.profileColumn(textCol)
    assert(p.rows === 52)
    assert(p.card === 50)
    assert(math.abs(p.uniqueness - 50.0 / 52) < 1e-9)
  }

  test("profileColumn signature matches MinHash over distinct lowercased values") {
    val p = Profiler.profileColumn(textCol)
    val expected = MinHash.signature(textCol.values.map(_.toLowerCase).distinct)
    assert(p.sig.toSeq === expected.toSeq)
  }

  test("profileColumn numeric stats populated for numeric columns") {
    val p = Profiler.profileColumn(numCol)
    assert(p.numMin === 3.0 && p.numMax === 20.0)
  }

  test("profileColumn numeric stats NaN for text columns") {
    val p = Profiler.profileColumn(textCol)
    assert(p.numMin.isNaN && p.numMax.isNaN)
  }

  test("text column with enough distinct values is tagged for text search") {
    assert(Profiler.profileColumn(textCol).hasTag(Tags.TextSearch))
  }

  test("categorical column with few distinct values is not text-searchable") {
    assert(!Profiler.profileColumn(catCol).hasTag(Tags.TextSearch))
  }

  test("date columns are excluded from join discovery") {
    assert(!Profiler.profileColumn(dateCol).hasTag(Tags.Joinable))
  }

  test("long-text columns are excluded from join discovery") {
    assert(!Profiler.profileColumn(longText).hasTag(Tags.Joinable))
  }

  test("id columns are joinable") {
    assert(Profiler.profileColumn(textCol).hasTag(Tags.Joinable))
  }

  test("content and metadata embeddings are 100-dimensional") {
    val p = Profiler.profileColumn(textCol)
    assert(p.contentEmb.length === 100 && p.metaEmb.length === 100)
  }

  test("format features capture digit fraction difference") {
    val pNum = Profiler.profileColumn(numCol)
    val pText = Profiler.profileColumn(textCol)
    assert(pNum.formatFeats(1) > 0.9)  // all digits
    assert(pText.formatFeats(1) < 0.5) // mostly letters
  }

  test("ref renders table.column") {
    assert(Profiler.profileColumn(textCol).ref === "drugs.drug_name")
  }

  test("profileColumns over Spark matches the driver-side profile") {
    val fromSpark = Profiler.profileColumns(spark, Seq(textCol, numCol, catCol))
    val local = Seq(textCol, numCol, catCol).map(Profiler.profileColumn)
    assert(fromSpark.map(_.ref).toSet === local.map(_.ref).toSet)
    val sparkByRef = fromSpark.map(p => p.ref -> p).toMap
    for (lp <- local) {
      val sp = sparkByRef(lp.ref)
      assert(sp.card === lp.card)
      assert(sp.sig.toSeq === lp.sig.toSeq)
      assert(sp.tags === lp.tags)
    }
  }

  test("profileColumns of empty input is empty") {
    assert(Profiler.profileColumns(spark, Seq.empty).isEmpty)
  }

  test("profileDocs builds bags without stopwords") {
    val docs = Seq(RawDoc("pm", "d1", "Study of drugmed5", "The drug drugmed5 binds strongly."))
    val ps = Profiler.profileDocs(spark, docs)
    assert(ps.size === 1)
    assert(ps.head.bag.contains("drugmed5"))
    assert(!ps.head.bag.contains("the"))
  }

  test("profileDocs applies the corpus doc-frequency filter") {
    val docs = (1 to 10).map(i => RawDoc("pm", s"d$i", s"title$i", s"ubiquitous term plus unique$i"))
    val ps = Profiler.profileDocs(spark, docs, maxDfFrac = 0.5)
    // "ubiquitous" lemmatizes to "ubiquitou" and occurs in every doc -> dropped
    assert(ps.forall(p => !p.bag.contains("ubiquitou") && !p.bag.contains("ubiquitous")))
    assert(ps.exists(_.bag.exists(_.startsWith("unique"))))
  }

  test("profileDocs keeps metadata embedding from the title only") {
    val docs = Seq(
      RawDoc("pm", "a", "enzyme report", "unrelated words entirely"),
      RawDoc("pm", "b", "enzyme report", "other unrelated body"))
    val ps = Profiler.profileDocs(spark, docs)
    val Seq(pa, pb) = ps.sortBy(_.id)
    assert(repro.embed.WordVectors.cosine(pa.metaEmb, pb.metaEmb) > 0.999)
  }

  test("nameTokens splits snake and camel case") {
    assert(Profiler.nameTokens("drug_id") === Seq("drug", "id"))
    assert(Profiler.nameTokens("drugName") === Seq("drug", "name"))
  }

  test("column cardinalities via DataFrame aggregation agree with DuckDB oracle") {
    import spark.implicits._
    val cols = Seq(textCol, numCol, catCol)
    val exploded = spark.createDataset(cols)
      .select($"table" as "tbl", $"column" as "col", explode($"values") as "value")
    val agg = exploded.groupBy($"tbl", $"col")
      .agg(countDistinct(lower(trim($"value"))) as "card")
    Oracle.assertEquivalent(
      agg,
      "SELECT tbl, col, COUNT(DISTINCT LOWER(TRIM(value))) AS card FROM cells GROUP BY tbl, col",
      "cells" -> exploded,
    )
  }
}
