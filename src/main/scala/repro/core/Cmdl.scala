package repro.core

import scala.util.Random

import org.apache.spark.sql.SparkSession

import repro.discover.{JoinDiscovery, UnionDiscovery}
import repro.embed.WordVectors
import repro.joint.{Mlp, TripletTraining}
import repro.label.{GoldTuning, LabelingFunctions, SnorkelLite}
import repro.lake.{ColRef, Lake}
import repro.profile.{ColumnProfile, DocProfile, Profiler}
import repro.sketch.MinHash
import repro.text.Bm25Index

/** The end-to-end CMDL system (Fig. 2): profiling → indexing → weak
  * supervision → joint representation → discovery front-ends.
  *
  * Construction runs the distributed profiler over both modalities and
  * builds every index of §3. `weakLabels` runs the Fig. 3 pipeline
  * (sampling, LF probes, optional gold tuning, generative EM, discriminator)
  * and returns a relatedness function over (doc, column) pairs; `trainJoint`
  * runs the Fig. 4/5 triplet workflow and returns joint embeddings for all
  * DEs of both modalities.
  */
final class Cmdl(spark: SparkSession, val lake: Lake, lfTopK: Int = 10) {

  val colProfiles: Seq[ColumnProfile] = Profiler.profileColumns(spark, lake.rawColumns)
  val docProfiles: Seq[DocProfile] = Profiler.profileDocs(spark, lake.docs)

  val colByRef: Map[String, ColumnProfile] = colProfiles.map(p => p.ref -> p).toMap
  val docById: Map[String, DocProfile] = docProfiles.map(d => d.id -> d).toMap

  /** The four labeling-function indexes of Fig. 3 (also Table 6's probes). */
  val lfs = new LabelingFunctions(colProfiles, lfTopK)

  /** BM25 over the document modality (content_search in Text mode). */
  lazy val bm25Docs = new Bm25Index(docProfiles.map(d => d.id -> d.bag).toMap)

  /** Containment-ranked syntactic join index (Table 3). */
  lazy val syntacticIndex = new JoinDiscovery.SyntacticIndex(colProfiles)

  /** Ensemble unionability index (Table 5, Fig. 7). */
  lazy val unionIndex = new UnionDiscovery.UnionIndex(colProfiles)

  def profilesIn(collections: String*): Seq[ColumnProfile] = {
    val set = collections.toSet
    colProfiles.filter(p => set.contains(p.collection))
  }

  /** PK-FK discovery over one database's collections (Table 4). */
  def pkfk(collection: String, cfg: JoinDiscovery.PkfkConfig = JoinDiscovery.PkfkConfig()): Set[(ColRef, ColRef)] =
    JoinDiscovery.pkfk(profilesIn(collection), cfg)

  // ------------------------------------------------------------------
  // Weak supervision (Fig. 3)
  // ------------------------------------------------------------------

  /** Discriminator features for a (doc, col) pair: the underlying similarity
    * scores of the four index families.
    */
  def pairFeatures(d: DocProfile, c: ColumnProfile): Array[Double] = Array(
    math.max(0.0, WordVectors.cosine(d.contentEmb, c.contentEmb)),
    MinHash.estContainment(d.sig, d.card, c.sig, c.card),
    math.min(1.0, lfs.bm25Content.score(d.bag, c.ref) / 10.0),
    math.max(0.0, WordVectors.cosine(d.metaEmb, c.metaEmb)),
  )

  final case class WeakLabels(
      lfAccuracies: Seq[Double],
      lfMask: Seq[Boolean],
      discWeights: Array[Double],
      sampledDocs: Seq[String],
      sampledCols: Seq[String],
  ) {
    /** Relatedness degree in [0,1] for any (doc, col) pair. */
    def rel(cmdl: Cmdl)(docId: String, colRef: String): Double =
      (cmdl.docById.get(docId), cmdl.colByRef.get(colRef)) match {
        case (Some(d), Some(c)) => SnorkelLite.predict(discWeights, cmdl.pairFeatures(d, c))
        case _                  => 0.0
      }
  }

  /** Runs the Fig. 3 training-dataset generator: sample both modalities,
    * probe the LF indexes, optionally switch off weak LFs using gold labels,
    * fit the generative model, then train the discriminator.
    *
    * @param gold optional tiny gold set: (docId, colRef) → 0/1
    */
  def weakLabels(
      sampleFrac: Double = 0.1,
      gold: Option[Map[(String, String), Int]] = None,
      seed: Long = 77L,
  ): WeakLabels = {
    val rnd = new Random(seed)
    val docs = rnd.shuffle(docProfiles.toVector)
      .take(math.max(12, (docProfiles.size * sampleFrac).toInt))
    val cols = rnd.shuffle(lfs.textCols.toVector)
      .take(math.max(12, (lfs.textCols.size * sampleFrac).toInt))
    val colRefs = cols.map(_.ref).toSet

    // one probe per sampled document labels it against every sampled column
    val probes: Seq[(DocProfile, Map[String, Set[String]])] = docs.map(d => (d, lfs.probe(d)))
    val pairs = for {
      (d, probe) <- probes
      c <- cols
      votes = lfs.votes(probe, c.ref)
    } yield SnorkelLite.LabeledPair(d.id, c.ref, votes)

    // the generative model only considers pairs voted 1 by at least one LF
    val positivePairs = pairs.filter(_.votes.sum > 0)

    val mask: Seq[Boolean] = gold match {
      case Some(g) if g.nonEmpty =>
        val probeById = probes.map { case (d, pr) => d.id -> pr }.toMap
        val goldVotes = g.toSeq.flatMap { case ((docId, colRef), label) =>
          probeById.get(docId).orElse(
            docById.get(docId).map(lfs.probe)
          ).map(pr => (lfs.votes(pr, colRef), label))
        }
        GoldTuning.keepMask(goldVotes)
      case _ => Seq.fill(lfs.names.size)(true)
    }

    val gen = SnorkelLite.generative(positivePairs, mask)

    // discriminator: probabilistic positives + the all-zero-vote pairs as
    // (near-)negatives so the classifier sees both classes
    val negPairs = rnd.shuffle(pairs.filter(_.votes.sum == 0))
      .take(math.max(positivePairs.size * 2, 50))
    val trainData =
      positivePairs.map(p => (pairFeatures(docById(p.doc), colByRef(p.col)), gen.probs((p.doc, p.col)))) ++
      negPairs.map(p => (pairFeatures(docById(p.doc), colByRef(p.col)), 0.02))
    val w = SnorkelLite.trainDiscriminator(trainData.toIndexedSeq, seed = seed)

    WeakLabels(gen.accuracies, mask, w, docs.map(_.id), cols.map(_.ref))
  }

  // ------------------------------------------------------------------
  // Joint representation (Figs. 4 & 5)
  // ------------------------------------------------------------------

  final case class Joint(model: Mlp, epochs: Int, lossHistory: Vector[Double],
      docEmb: Map[String, Array[Float]], colEmb: Map[String, Array[Float]])

  /** Trains the triplet model on the weak labels and applies it to all DEs. */
  def trainJoint(labels: WeakLabels, cfg: TripletTraining.Config = TripletTraining.Config()): Joint = {
    val rel = labels.rel(this) _
    val docDes = docProfiles.map(d => TripletTraining.De(d.id, TripletTraining.encode(d.metaEmb, d.contentEmb)))
    val colDes = lfs.textCols.map(c => TripletTraining.De(c.ref, TripletTraining.encode(c.metaEmb, c.contentEmb)))
    val result = TripletTraining.train(docDes, colDes, rel, cfg)
    Joint(result.model, result.epochs, result.lossHistory,
      docEmb = TripletTraining.applyModel(result.model, docDes),
      colEmb = TripletTraining.applyModel(result.model, colDes))
  }
}
