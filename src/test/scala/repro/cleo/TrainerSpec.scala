package repro.cleo

import org.scalatest.funsuite.AnyFunSuite
import repro.ml.Metrics
import repro.scopesim._

class TrainerSpec extends AnyFunSuite {

  private lazy val cfg = WorkloadGen.cluster(4)
  private lazy val samples = Logs.samples(WorkloadGen.genJobs(cfg), cfg.gtConfig)
  private lazy val train = samples.filter(_.day <= 2)
  private lazy val test = samples.filter(_.day == 3)
  private lazy val set = {
    val indivD1 = Trainer.trainIndividuals(samples.filter(_.day == 1))
    val stacked = Trainer.withCombined(indivD1, samples.filter(_.day == 2))
    Trainer.trainIndividuals(train).copy(combined = stacked.combined)
  }

  test("signatures with fewer than 5 occurrences get no model") {
    val counts = train.groupBy(_.sigSub).view.mapValues(_.size).toMap
    val modeled = Trainer.trainFamily(train, Family.Subgraph)
    modeled.keys.foreach(k => assert(counts(k) >= Trainer.MinOccurrences))
    val under = counts.filter(_._2 < Trainer.MinOccurrences).keys
    under.foreach(k => assert(!modeled.contains(k)))
  }

  test("operator family covers every test sample") {
    test.foreach(s => assert(set.covers(Family.Operator, s)))
  }

  test("coverage increases from subgraph to approx to input to operator") {
    def cov(f: Family) = test.count(set.covers(f, _)).toDouble / test.size
    val c = Family.all.map(cov)
    assert(c(0) <= c(1) + 0.02 && c(1) <= c(2) + 0.02 && c(2) <= c(3), c.mkString(","))
    assert(c(3) == 1.0)
  }

  test("subgraph coverage is partial (accuracy-coverage tradeoff exists)") {
    val cov = test.count(set.covers(Family.Subgraph, _)).toDouble / test.size
    assert(cov > 0.3 && cov < 0.95, s"subgraph coverage $cov")
  }

  test("median error increases from specialized to general models") {
    def med(f: Family) = {
      val covered = test.filter(set.covers(f, _))
      Metrics.medianErrorPct(covered.map(s => set.predictFamily(f, s).get), covered.map(_.actual))
    }
    val sub = med(Family.Subgraph)
    val op = med(Family.Operator)
    assert(sub < op, s"sub=$sub op=$op")
  }

  test("every learned family beats the default cost model on covered samples") {
    for (f <- Family.all) {
      val covered = test.filter(set.covers(f, _))
      val learned = Metrics.medianErrorPct(covered.map(s => set.predictFamily(f, s).get), covered.map(_.actual))
      val dflt = Metrics.medianErrorPct(covered.map(_.defaultCost), covered.map(_.actual))
      assert(learned < dflt / 2, s"${f.name}: learned=$learned default=$dflt")
    }
  }

  test("predictions are non-negative") {
    test.take(2000).foreach { s =>
      Family.all.foreach(f => set.predictFamily(f, s).foreach(p => assert(p >= 0.0)))
      assert(set.predict(s) >= 0.0)
    }
  }

  test("combined model covers 100% of samples including unseen plans") {
    test.foreach(s => assert(set.predict(s) >= 0.0))
    // a synthetic unseen operator sample: still predictable via operator model
    val s = test.head.copy(sigSub = 0x123456L, sigApprox = 0x234567L, sigInput = 0x345678L)
    assert(set.predict(s) >= 0.0)
  }

  test("combined model approaches specialized accuracy at full coverage") {
    val comb = Metrics.medianErrorPct(test.map(set.predict), test.map(_.actual))
    val covered = test.filter(set.covers(Family.Operator, _))
    val op = Metrics.medianErrorPct(covered.map(s => set.predictFamily(Family.Operator, s).get),
      covered.map(_.actual))
    assert(comb < op, s"combined=$comb operator=$op")
  }

  test("combined correlation is far above the default model's") {
    val cComb = Metrics.pearson(test.map(set.predict), test.map(_.actual))
    val cDflt = Metrics.pearson(test.map(_.defaultCost), test.map(_.actual))
    // Cluster 4 is the cleanest cluster, where the default model correlates
    // best (see DefaultCostModelSpec); a +0.25 gap is still decisive.
    assert(cComb > cDflt + 0.25, s"combined=$cComb default=$cDflt")
  }

  test("spark-parallel training equals local training") {
    // exercised via the bench suite (shared SparkSession); here check the
    // local grouping logic is deterministic
    val a = Trainer.trainFamily(train.take(5000), Family.Input)
    val b = Trainer.trainFamily(train.take(5000), Family.Input)
    assert(a.keySet == b.keySet)
    val k = a.keySet.head
    assert(a(k).net.weights.sameElements(b(k).net.weights))
  }

  test("meta features have the documented shape") {
    val mf = set.metaFeatures(test.head)
    assert(mf.length == 14)
    assert(mf.forall(v => !v.isNaN && !v.isInfinite))
  }

  test("theta falls back to the operator model for unseen subgraphs") {
    val pred = new CleoPredictor(set)
    val run = WorkloadGen.genJobs(cfg).find(_.day == 3).get
    val n = run.root.allNodes.head
    val (tp, tc) = pred.theta(n)
    assert(!tp.isNaN && !tc.isNaN)
  }
}
