package repro.sketch

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MinHashSpec extends AnyFunSuite {

  private def set(n: Int, prefix: String = "v"): Set[String] = (1 to n).map(prefix + _).toSet

  test("signature is deterministic") {
    val s = set(50)
    assert(MinHash.signature(s).toSeq === MinHash.signature(s).toSeq)
  }

  test("signature is order-independent") {
    val vals = (1 to 40).map("x" + _)
    assert(MinHash.signature(vals).toSeq === MinHash.signature(Random.shuffle(vals)).toSeq)
  }

  test("signature of empty set is all MaxValue") {
    assert(MinHash.signature(Nil).forall(_ == Long.MaxValue))
  }

  test("estJaccard of identical sets is 1") {
    val sig = MinHash.signature(set(100))
    assert(MinHash.estJaccard(sig, sig) === 1.0)
  }

  test("estJaccard of disjoint sets is near 0") {
    val a = MinHash.signature(set(100, "a"))
    val b = MinHash.signature(set(100, "b"))
    assert(MinHash.estJaccard(a, b) < 0.05)
  }

  test("estJaccard approximates true jaccard within 0.12 at k=128") {
    val rnd = new Random(13)
    for (_ <- 1 to 20) {
      val a = (1 to 200).filter(_ => rnd.nextBoolean()).map("k" + _).toSet
      val b = (1 to 200).filter(_ => rnd.nextBoolean()).map("k" + _).toSet
      if (a.nonEmpty && b.nonEmpty) {
        val est = MinHash.estJaccard(MinHash.signature(a), MinHash.signature(b))
        assert(math.abs(est - Similarity.jaccard(a, b)) < 0.12)
      }
    }
  }

  test("estJaccard ignores empty-set sentinel rows") {
    val e = MinHash.signature(Nil)
    assert(MinHash.estJaccard(e, e) === 0.0)
  }

  test("estContainment of subset in superset is near 1") {
    val a = set(20)
    val b = set(400)
    val est = MinHash.estContainment(MinHash.signature(a), a.size, MinHash.signature(b), b.size)
    assert(est > 0.8)
  }

  test("estContainment is robust to skew where jaccard is not") {
    val a = set(20); val b = set(400)
    val sa = MinHash.signature(a); val sb = MinHash.signature(b)
    assert(MinHash.estJaccard(sa, sb) < 0.15)
    assert(MinHash.estContainment(sa, a.size, sb, b.size) > 0.8)
  }

  test("estContainment of disjoint sets is near 0") {
    val a = set(50, "a"); val b = set(50, "b")
    val est = MinHash.estContainment(MinHash.signature(a), a.size, MinHash.signature(b), b.size)
    assert(est < 0.1)
  }

  test("estContainment with zero cardinality is 0") {
    val s = MinHash.signature(set(10))
    assert(MinHash.estContainment(s, 0, s, 10) === 0.0)
  }

  test("estContainment capped at 1") {
    val a = set(100)
    val est = MinHash.estContainment(MinHash.signature(a), a.size, MinHash.signature(a), a.size)
    assert(est <= 1.0 && est > 0.99)
  }

  test("signature length parameter is honoured") {
    assert(MinHash.signature(set(10), numHashes = 64).length === 64)
  }

  test("estJaccard rejects mismatched lengths") {
    intercept[IllegalArgumentException] {
      MinHash.estJaccard(MinHash.signature(set(5), 64), MinHash.signature(set(5), 128))
    }
  }
}
