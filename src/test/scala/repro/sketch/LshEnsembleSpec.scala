package repro.sketch

import org.scalatest.funsuite.AnyFunSuite

class LshEnsembleSpec extends AnyFunSuite {

  private def set(lo: Int, hi: Int, prefix: String = "v"): Set[String] =
    (lo to hi).map(prefix + _).toSet

  // 40 columns with cardinalities from 20 to 800; c0 ⊂ c1 ⊂ ... by construction
  private val nested: Seq[(String, Set[String])] =
    (0 until 8).map(i => (s"c$i", set(1, 20 * (i + 1) * (i + 1))))
  private val noise: Seq[(String, Set[String])] =
    (0 until 32).map(i => (s"n$i", set(1, 50, s"noise${i}_")))
  private val index = LshEnsemble.build(nested ++ noise)

  test("index size matches entries") { assert(index.size === 40) }

  test("query finds supersets of a contained query") {
    val q = set(1, 20)
    val res = index.query(MinHash.signature(q), q.size, 8).map(_._1)
    // every nested column contains q entirely
    assert(res.count(_.startsWith("c")) >= 6)
  }

  test("top result has near-perfect containment score") {
    val q = set(1, 20)
    val res = index.query(MinHash.signature(q), q.size, 3)
    assert(res.head._2 > 0.85)
  }

  test("noise columns do not outrank true supersets") {
    val q = set(1, 80)
    val res = index.query(MinHash.signature(q), q.size, 5)
    assert(res.take(3).forall(_._1.startsWith("c")))
  }

  test("disjoint query yields no high-containment hits") {
    val q = set(1, 30, "zzz_")
    val res = index.query(MinHash.signature(q), q.size, 5)
    assert(res.forall(_._2 < 0.5))
  }

  test("queryThreshold keeps only entries above the threshold") {
    val q = set(1, 20)
    val res = index.queryThreshold(MinHash.signature(q), q.size, 0.8)
    assert(res.nonEmpty)
    assert(res.forall(_._2 >= 0.8))
  }

  test("queryThreshold at 0 returns all banded candidates sorted") {
    val q = set(1, 20)
    val res = index.queryThreshold(MinHash.signature(q), q.size, 0.0)
    assert(res.map(_._2).sliding(2).forall(p => p.size < 2 || p.head >= p(1)))
  }

  test("query respects k") {
    val q = set(1, 20)
    assert(index.query(MinHash.signature(q), q.size, 2).size <= 2)
  }

  test("empty index answers empty") {
    val e = new LshEnsemble(Seq.empty)
    assert(e.query(MinHash.signature(set(1, 5)), 5, 3).isEmpty)
  }

  test("partitioning does not lose entries (self-query recalls self)") {
    for ((id, s) <- nested) {
      val res = index.query(MinHash.signature(s), s.size, 40)
      assert(res.map(_._1).contains(id), s"self-recall failed for $id")
    }
  }
}
