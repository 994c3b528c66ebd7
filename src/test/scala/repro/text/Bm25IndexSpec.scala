package repro.text

import org.scalatest.funsuite.AnyFunSuite

class Bm25IndexSpec extends AnyFunSuite {

  private val docs = Map(
    "d1" -> Seq("drug", "enzyme", "thymidylate", "synthase"),
    "d2" -> Seq("drug", "interaction", "warfarin"),
    "d3" -> Seq("city", "population", "census"),
    "d4" -> Seq("drug", "drug", "drug", "dose"),
  )
  private val idx = new Bm25Index(docs)

  test("size reflects corpus") { assert(idx.size === 4) }

  test("vocabulary covers all terms") {
    assert(idx.vocabulary.contains("warfarin") && idx.vocabulary.contains("census"))
  }

  test("query ranks the doc containing a unique term first") {
    assert(idx.query(Seq("warfarin"), 2).head._1 === "d2")
  }

  test("query returns at most k results") {
    assert(idx.query(Seq("drug"), 2).size === 2)
  }

  test("query for unknown term returns nothing") {
    assert(idx.query(Seq("nonexistent"), 5).isEmpty)
  }

  test("query on multiple terms accumulates scores") {
    val top = idx.query(Seq("thymidylate", "synthase"), 1).head
    assert(top._1 === "d1")
  }

  test("rare terms outrank common ones (idf)") {
    // d3 shares only 'census' with the query but census is rarer than drug
    val res = idx.query(Seq("census", "drug"), 4).toMap
    assert(res("d3") > res("d2"))
  }

  test("tf saturation: repeated term scores higher but sublinearly") {
    val one = idx.score(Seq("drug"), "d1")
    val three = idx.score(Seq("drug"), "d4")
    assert(three > one)
    assert(three < 3 * one)
  }

  test("score of non-matching doc is zero") {
    assert(idx.score(Seq("drug"), "d3") === 0.0)
  }

  test("score of unknown doc id is zero") {
    assert(idx.score(Seq("drug"), "nope") === 0.0)
  }

  test("BM25 scores are positive for matches") {
    assert(idx.query(Seq("drug"), 4).forall(_._2 > 0))
  }

  test("LM Dirichlet ranks the matching doc first") {
    assert(idx.queryLmDirichlet(Seq("warfarin"), 1).head._1 === "d2")
  }

  test("LM Dirichlet returns empty when no query term is in the vocabulary") {
    assert(idx.queryLmDirichlet(Seq("zzz"), 3).isEmpty)
  }

  test("LM Dirichlet respects k") {
    assert(idx.queryLmDirichlet(Seq("drug"), 2).size === 2)
  }

  test("empty index answers empty") {
    val e = new Bm25Index(Map.empty)
    assert(e.query(Seq("x"), 3).isEmpty)
    assert(e.size === 0)
  }

  test("deterministic ordering on ties (by id)") {
    val tied = new Bm25Index(Map("a" -> Seq("t", "u"), "b" -> Seq("t", "w")))
    assert(tied.query(Seq("t"), 2).map(_._1) === Seq("a", "b"))
  }
}
