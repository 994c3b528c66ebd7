package repro.joint

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

import repro.embed.WordVectors

class MlpSpec extends AnyFunSuite {

  test("forward output has the configured dimensionality") {
    val m = new Mlp(inDim = 10, hiddenDim = 8, outDim = 4)
    assert(m.embed(Array.fill(10)(0.1)).length === 4)
  }

  test("forward is deterministic for a fixed seed") {
    val x = Array.fill(200)(0.3)
    val a = new Mlp(seed = 9).embed(x)
    val b = new Mlp(seed = 9).embed(x)
    assert(a.toSeq === b.toSeq)
  }

  test("dist2 is squared euclidean") {
    val m = new Mlp(2, 2, 2)
    assert(m.dist2(Array(0.0, 0.0), Array(3.0, 4.0)) === 25.0)
  }

  test("triplet loss is zero when the margin is satisfied") {
    val m = new Mlp(4, 4, 2, seed = 1)
    val a = Array(1.0, 0.0, 0.0, 0.0)
    // identical positive: d(a,p)=0; any negative with d>margin gives 0 loss
    val far = Array(-5.0, 5.0, -5.0, 5.0)
    val loss = m.tripletLoss(a, a, far, margin = 0.01)
    assert(loss === 0.0 || loss < 0.2) // allow tiny margins on random init
  }

  test("tripletStep reduces the loss of a violated triplet") {
    val m = new Mlp(6, 8, 3, seed = 2)
    val rnd = new Random(4)
    val a = Array.fill(6)(rnd.nextDouble())
    val p = Array.fill(6)(rnd.nextDouble())
    val n = a.map(_ + 0.01) // negative nearly identical to anchor: violated
    val before = m.tripletLoss(a, p, n, 0.2)
    var i = 0
    while (i < 60) { m.tripletStep(a, p, n, 0.2, 0.01); i += 1 }
    val after = m.tripletLoss(a, p, n, 0.2)
    assert(after < before)
  }

  test("tripletStep returns zero and leaves weights alone on satisfied triplets") {
    val m = new Mlp(4, 4, 2, seed = 3)
    val a = Array(1.0, 1.0, 0.0, 0.0)
    val n = Array(-9.0, 9.0, -9.0, 9.0)
    // warm up until satisfied, then verify a no-op step
    var guard = 0
    while (m.tripletLoss(a, a, n, 0.05) > 0 && guard < 200) { m.tripletStep(a, a, n, 0.05, 0.05); guard += 1 }
    if (m.tripletLoss(a, a, n, 0.05) == 0.0) {
      val w = m.w1.map(_.clone())
      assert(m.tripletStep(a, a, n, 0.05, 0.05) === 0.0)
      assert(m.w1.zip(w).forall { case (r1, r2) => r1.sameElements(r2) })
    }
  }
}

class TripletTrainingSpec extends AnyFunSuite {
  import TripletTraining._

  test("encode concatenates metadata and content embeddings") {
    val m = Array.fill(3)(1f); val c = Array.fill(2)(2f)
    assert(encode(m, c).toSeq === Seq(1.0, 1.0, 1.0, 2.0, 2.0))
  }

  /** Tiny two-topic world: docs/cols of topic A are related, topic B not. */
  private def world(seed: Int) = {
    def de(id: String, word: String) = {
      val emb = WordVectors.wordVector(word)
      De(id, encode(emb, emb))
    }
    val docs = (1 to 8).map(i => de(s"docA$i", s"topicalpha$i")) ++
      (1 to 8).map(i => de(s"docB$i", s"topicbeta$i"))
    val cols = (1 to 8).map(i => de(s"colA$i", s"topicalpha${i + 20}")) ++
      (1 to 8).map(i => de(s"colB$i", s"topicbeta${i + 20}"))
    val rel = (d: String, c: String) =>
      if (d.startsWith("docA") == c.startsWith("colA")) 0.9 else 0.1
    (docs, cols, rel)
  }

  test("training converges and loss decreases") {
    val (docs, cols, rel) = world(1)
    val res = train(docs, cols, rel, Config(maxEpochs = 60, batchFrac = 0.5, seed = 2))
    assert(res.lossHistory.nonEmpty)
    assert(res.lossHistory.last <= res.lossHistory.max)
  }

  test("after training, related pairs are closer than unrelated pairs") {
    val (docs, cols, rel) = world(2)
    val res = train(docs, cols, rel, Config(maxEpochs = 80, batchFrac = 0.5, seed = 3))
    val emb = applyModel(res.model, docs ++ cols)
    def d(a: String, b: String): Double = {
      val (x, y) = (emb(a), emb(b))
      x.zip(y).map { case (u, v) => (u - v) * (u - v) }.sum
    }
    val related = d("docA1", "colA1")
    val unrelated = d("docA1", "colB1")
    assert(related < unrelated)
  }

  test("hard sampling emits exactly one triplet per eligible anchor") {
    val (docs, cols, rel) = world(3)
    val m = new Mlp(seed = 1)
    val triplets = tripletsFor(m, docs.head, cols, (a, b) => rel(a, b), Config())
    assert(triplets.size === 1)
  }

  test("disabled hard sampling emits the quadratic triplet set") {
    val (docs, cols, rel) = world(4)
    val m = new Mlp(seed = 1)
    val t = tripletsFor(m, docs.head, cols, (a, b) => rel(a, b),
      Config(hardStrategy = HardStrategy.None))
    assert(t.size === 8 * 8)
  }

  test("anchors without both positive and negative samples are ignored") {
    val (docs, cols, _) = world(5)
    val m = new Mlp(seed = 1)
    assert(tripletsFor(m, docs.head, cols, (_, _) => 0.9, Config()).isEmpty)
    assert(tripletsFor(m, docs.head, cols, (_, _) => 0.1, Config()).isEmpty)
  }

  test("hard sampling generates fewer total triplets than the quadratic mode") {
    val (docs, cols, rel) = world(6)
    val hard = train(docs, cols, rel, Config(maxEpochs = 5, batchFrac = 0.5, seed = 4))
    val full = train(docs, cols, rel, Config(maxEpochs = 5, batchFrac = 0.5, seed = 4,
      hardStrategy = HardStrategy.None))
    assert(hard.totalTriplets < full.totalTriplets)
  }

  test("median strategy also trains") {
    val (docs, cols, rel) = world(7)
    val res = train(docs, cols, rel, Config(maxEpochs = 20, batchFrac = 0.5,
      hardStrategy = HardStrategy.Median, seed = 5))
    assert(res.epochs > 0)
  }

  test("training requires both modalities") {
    intercept[IllegalArgumentException] {
      train(Seq.empty, Seq(De("c", Array(1.0))), (_, _) => 0.5)
    }
  }
}
