package repro.discover

import repro.{SparkSpec, TestFixtures}
import repro.lake.ColRef

class JoinDiscoverySpec extends SparkSpec {

  private lazy val cmdl = TestFixtures.cmdlPharma
  private lazy val drugbank = cmdl.profilesIn("DrugBank")
  private lazy val index = new JoinDiscovery.SyntacticIndex(drugbank)

  test("syntactic index finds the PK column for a skewed FK query") {
    val fk = cmdl.colByRef("drug_interactions.drug_id")
    val top = index.topK(fk, 15).map(_._1)
    assert(top.contains(ColRef("drugs", "drug_id")))
  }

  test("containment score of a contained FK is near 1") {
    val fk = cmdl.colByRef("drug_interactions.drug_id")
    val hits = index.topK(fk, 15).toMap
    assert(hits.get(ColRef("drugs", "drug_id")).exists(_ > 0.8))
  }

  test("topK never returns columns of the query's own table") {
    val q = cmdl.colByRef("drugs.drug_id")
    assert(index.topK(q, 20).forall(_._1.table != "drugs"))
  }

  test("topK scores are sorted descending") {
    val q = cmdl.colByRef("drugs.drug_id")
    val scores = index.topK(q, 15).map(_._2)
    assert(scores.sliding(2).forall(p => p.size < 2 || p.head >= p(1)))
  }

  test("topK respects k") {
    val q = cmdl.colByRef("drugs.drug_id")
    assert(index.topK(q, 3).size <= 3)
  }

  test("unrelated columns do not reach high containment scores") {
    val q = cmdl.colByRef("drugs.drug_name")
    val hits = index.topK(q, 10)
    // drug names only live in drugs + synthetic variants; within DrugBank no
    // other column shares the domain
    assert(hits.forall(_._2 < 1.01))
  }

  test("pkfk finds the clean FK→PK links of DrugBank") {
    val links = JoinDiscovery.pkfk(drugbank)
    assert(links.contains((ColRef("drugs", "drug_id"), ColRef("drug_interactions", "drug_id"))))
    assert(links.contains((ColRef("trials", "trial_id"), ColRef("trial_outcomes", "trial_id"))))
  }

  test("pkfk tolerates duplicate-bearing PKs (CMDL's relaxed key-ness)") {
    val links = JoinDiscovery.pkfk(drugbank)
    // enzymes.enzyme_id has ~8% duplicate rows; CMDL still accepts it as key
    assert(links.contains((ColRef("enzymes", "enzyme_id"), ColRef("enzyme_targets", "enzyme_id"))))
  }

  test("pkfk rejects pairs with dissimilar names") {
    val chembl = cmdl.profilesIn("ChEMBL")
    val links = JoinDiscovery.pkfk(chembl)
    // record_id draws from the molregno space but is name-dissimilar
    assert(!links.contains((ColRef("molecule_dictionary", "molregno"), ColRef("compound_records", "record_id"))))
  }

  test("pkfk keeps name-similar true links in ChEMBL") {
    val chembl = cmdl.profilesIn("ChEMBL")
    val links = JoinDiscovery.pkfk(chembl)
    assert(links.contains((ColRef("molecule_dictionary", "molregno"), ColRef("compound_properties", "molregno"))))
  }

  test("numeric PK-FK rule fires on ChEBI ranges") {
    val chebi = cmdl.profilesIn("ChEBI")
    val links = JoinDiscovery.pkfk(chebi)
    assert(links.contains((ColRef("compounds", "id"), ColRef("names", "compound_id"))))
  }

  test("numeric rule rejects below-threshold range overlap") {
    val chebi = cmdl.profilesIn("ChEBI")
    val links = JoinDiscovery.pkfk(chebi)
    // structures.compound_id covers only ~41% of the PK range
    assert(!links.contains((ColRef("compounds", "id"), ColRef("structures", "compound_id"))))
  }

  test("numeric rule is shared verbatim with Aurum (ChEBI parity)") {
    val chebi = cmdl.profilesIn("ChEBI")
    val cmdlLinks = JoinDiscovery.pkfk(chebi)
    val aurumLinks = repro.baseline.Aurum.pkfk(chebi)
    assert(cmdlLinks === aurumLinks)
  }

  test("pkfk produces false positives between near-unique FK columns") {
    val links = JoinDiscovery.pkfk(drugbank)
    val gt = TestFixtures.pharma.pkfkBenches.find(_.id == "2D-DrugBank").get.gt
    assert((links -- gt).nonEmpty, "expected CMDL to over-report on duplicate-ridden DrugBank")
  }
}
