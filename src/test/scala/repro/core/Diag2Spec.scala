package repro.core
import repro.{SparkSpec, TestFixtures}
import repro.sketch.MinHash
class Diag2Spec extends SparkSpec {
  test("diag containment") {
    val cmdl = TestFixtures.cmdlPharma
    val fk = cmdl.colByRef("drug_interactions.drug_id")
    val pk = cmdl.colByRef("drugs.drug_id")
    println(s"fk card=${fk.card} pk card=${pk.card}")
    println(s"estJ=${MinHash.estJaccard(fk.sig, pk.sig)}")
    println(s"estCont fk->pk=${MinHash.estContainment(fk.sig, fk.card, pk.sig, pk.card)}")
    val trueVals = TestFixtures.pharma.valueSet(repro.lake.ColRef("drug_interactions","drug_id"))
    val pkVals = TestFixtures.pharma.valueSet(repro.lake.ColRef("drugs","drug_id"))
    println(s"true containment=${repro.sketch.Similarity.containment(trueVals, pkVals)} trueJ=${repro.sketch.Similarity.jaccard(trueVals, pkVals)}")
    succeed
  }
}
